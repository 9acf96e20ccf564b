"""Uniform adapters + timers for the Table II / Table III harnesses.

Every compressor is wrapped in an adapter exposing::

    build(ts)        -> artifact (measures compression time)
    size_bytes       -> honest serialised size
    decompress()     -> the original value array
    access(k)        -> one value (random access operation)

XOR codecs and ALP consume the IEEE-754 bits of the float values;
NeaTS / DAC / LeCo and the general-purpose codecs consume the
fixed-precision int64 values — mirroring Section IV-A1 ("unless the
compressor is designed for doubles").  Codecs without native random access
go through the 1000-value :class:`BlockStore` wrapper (Section IV-A2).
"""
from __future__ import annotations

import time
from dataclasses import dataclass, field

import numpy as np

from .baselines.alp import ALPCodec
from .baselines.blockstore import BlockStore
from .baselines.chimp import Chimp128Codec, ChimpCodec
from .baselines.dac import DACCodec
from .baselines.gorilla import GorillaCodec
from .baselines.gp import GP_CODECS, GPCodec
from .baselines.leco import LeCoCodec
from .baselines.tsxor import TSXorCodec
from .core.neats import NeaTS
from .tsdata import TimeSeries

__all__ = ["Adapter", "ALL_LOSSLESS", "build_adapter", "Measurement", "measure"]


@dataclass
class Measurement:
    name: str
    dataset: str
    ratio_pct: float
    compress_mb_s: float
    decompress_mb_s: float
    random_access_mb_s: float
    extra: dict = field(default_factory=dict)


class Adapter:
    name: str = "?"

    def input_of(self, ts: TimeSeries) -> np.ndarray:
        raise NotImplementedError

    def build(self, values: np.ndarray):
        raise NotImplementedError

    def size_bytes(self, art) -> int:
        raise NotImplementedError

    def decompress(self, art) -> np.ndarray:
        raise NotImplementedError

    def access(self, art, k: int):
        raise NotImplementedError


class _BlockwiseAdapter(Adapter):
    """GP codecs + XOR streams via the 1000-value block wrapper."""

    def __init__(self, codec, domain: str):
        self.codec = codec
        self.name = codec.name
        self.domain = domain

    def input_of(self, ts):
        return ts.floats.view(np.uint64) if self.domain == "bits" else ts.ints

    def build(self, values):
        return BlockStore(self.codec, values)

    def size_bytes(self, art):
        return art.size_bytes

    def decompress(self, art):
        return art.decompress()

    def access(self, art, k):
        return art.access(k)


class _NeaTSAdapter(Adapter):
    def __init__(self, variant: str = "neats", label: str | None = None):
        self.variant = variant
        self.name = label or {"neats": "NeaTS", "leats": "LeaTS", "sneats": "SNeaTS"}[variant]

    def input_of(self, ts):
        return ts.ints

    def build(self, values):
        return NeaTS.compress(values, variant=self.variant)

    def size_bytes(self, art):
        return art.size_bytes

    def decompress(self, art):
        return art.decompress()

    def access(self, art, k):
        return art.access(k)


class _DACAdapter(Adapter):
    name = "DAC"

    def input_of(self, ts):
        return ts.ints

    def build(self, values):
        return DACCodec().build(values)

    def size_bytes(self, art):
        return art.size_bits // 8 + 16

    def decompress(self, art):
        return art.decompress()

    def access(self, art, k):
        return art.access(k)


class _LeCoAdapter(Adapter):
    name = "LeCo"

    def input_of(self, ts):
        return ts.ints

    def build(self, values):
        return LeCoCodec().compress(values)

    def size_bytes(self, art):
        return art.size_bytes

    def decompress(self, art):
        return art.decompress()

    def access(self, art, k):
        return art.access(k)


class _ALPAdapter(Adapter):
    name = "ALP"

    def input_of(self, ts):
        return ts.floats

    def build(self, values):
        return ALPCodec().compress(values)

    def size_bytes(self, art):
        return art.size_bytes

    def decompress(self, art):
        return art.decompress()

    def access(self, art, k):
        return art.access(k)


#: Table III column order: 5 general-purpose + 8 special-purpose
ALL_LOSSLESS = (
    GP_CODECS
    + ["Gorilla", "Chimp", "Chimp128", "TSXor", "DAC", "LeCo", "ALP", "NeaTS"]
)


def build_adapter(name: str) -> Adapter:
    if name in GP_CODECS:
        return _BlockwiseAdapter(GPCodec(name), "bytes")
    if name == "Gorilla":
        return _BlockwiseAdapter(GorillaCodec(), "bits")
    if name == "Chimp":
        return _BlockwiseAdapter(ChimpCodec(), "bits")
    if name == "Chimp128":
        return _BlockwiseAdapter(Chimp128Codec(), "bits")
    if name == "TSXor":
        return _BlockwiseAdapter(TSXorCodec(), "bits")
    if name == "DAC":
        return _DACAdapter()
    if name == "LeCo":
        return _LeCoAdapter()
    if name == "ALP":
        return _ALPAdapter()
    if name == "NeaTS":
        return _NeaTSAdapter("neats")
    if name == "LeaTS":
        return _NeaTSAdapter("leats")
    if name == "SNeaTS":
        return _NeaTSAdapter("sneats")
    raise ValueError(name)


def measure(name: str, ts: TimeSeries, *, n_access: int = 2000, seed: int = 0, verify: bool = True) -> Measurement:
    """Compress, decompress, random-access one dataset with one codec."""
    ad = build_adapter(name)
    values = ad.input_of(ts)
    mb = ts.original_bytes / 1e6

    t0 = time.perf_counter()
    art = ad.build(values)
    t_comp = time.perf_counter() - t0

    t0 = time.perf_counter()
    dec = ad.decompress(art)
    t_dec = time.perf_counter() - t0
    if verify and not np.array_equal(np.asarray(dec), values):
        raise AssertionError(f"{name} is not lossless on {ts.name}")

    rng = np.random.default_rng(seed)
    idx = rng.integers(0, ts.n, n_access)
    t0 = time.perf_counter()
    for k in idx:
        ad.access(art, int(k))
    t_ra = time.perf_counter() - t0
    if verify:
        for k in idx[:20]:
            got = ad.access(art, int(k))
            if got != values[k]:
                raise AssertionError(f"{name} random access wrong on {ts.name}@{k}")

    return Measurement(
        name=name,
        dataset=ts.name,
        ratio_pct=100.0 * ad.size_bytes(art) / ts.original_bytes,
        compress_mb_s=mb / t_comp if t_comp > 0 else float("inf"),
        decompress_mb_s=mb / t_dec if t_dec > 0 else float("inf"),
        random_access_mb_s=(n_access * 8 / 1e6) / t_ra if t_ra > 0 else float("inf"),
    )
