"""Directly Addressable Codes (Brisaboa, Ladra, Navarro, IP&M 2013).

Splits each (zigzag-encoded) value into fixed-width chunks; level ``l``
stores the l-th chunk of every value that still has one, plus a bitvector
marking continuation.  Random access to value ``i`` walks the levels with
one rank per level — the fastest random access in the paper's Table III,
at a mediocre compression ratio, which is exactly the trade-off we
reproduce.

The chunk width is chosen per input among {2, 4, 8, 16} to minimise total
size (the original optimises level widths with DP; a global width search
captures the same knob).

Performance note: the stored structure is the packed chunk arrays and the
continuation bitvectors (``size_bits`` counts exactly those plus the rank
directories); like NeaTS's ``_build_cache``, the decode paths use a
precomputed cumulative-rank array per level — the numpy stand-in for the
O(1) C rank that the original relies on.
"""
from __future__ import annotations

import numpy as np

from ..core.bitstream import PackedArray, gather_packed, pad_words
from ..core.bitvector import RankBitvector

__all__ = ["DACCodec", "DAC"]


def _zigzag(v: np.ndarray) -> np.ndarray:
    v = v.astype(np.int64)
    return ((v << 1) ^ (v >> 63)).astype(np.uint64)


def _unzigzag(u: np.ndarray) -> np.ndarray:
    u = u.astype(np.uint64)
    return ((u >> np.uint64(1)) ^ (~(u & np.uint64(1)) + np.uint64(1))).astype(np.int64)


class DAC:
    """The structure itself: levels of chunks + continuation bitvectors."""

    def __init__(self, values: np.ndarray, width: int):
        u = _zigzag(np.asarray(values, dtype=np.int64))
        self.n = len(u)
        self.width = width
        self.levels: list[PackedArray] = []
        self.conts: list[RankBitvector] = []
        self._ranks: list[np.ndarray] = []  # exclusive rank1 per level position
        self._conts_bool: list[np.ndarray] = []  # decode-side cache
        cur = u
        mask = np.uint64((1 << width) - 1)
        while len(cur):
            chunk = cur & mask
            rest = cur >> np.uint64(width)
            has_more = rest != 0
            self.levels.append(PackedArray(chunk.tolist(), width=width))
            self.conts.append(RankBitvector(np.nonzero(has_more)[0], len(cur)))
            self._ranks.append(np.cumsum(has_more) - has_more)  # exclusive
            self._conts_bool.append(has_more)
            cur = rest[has_more]
        self._level_words = [pad_words(p.words) for p in self.levels]
        # pure-Python mirrors for the scalar access hot path (numpy scalar
        # indexing costs ~100x a C rank; this is the decode-side cache,
        # like NeaTS._build_cache)
        self._words_int = [[int(w) for w in lw] for lw in self._level_words]
        self._conts_list = [hb.tolist() for hb in self._conts_bool]
        self._ranks_list = [r.tolist() for r in self._ranks]

    def access(self, i: int) -> int:
        v = 0
        shift = 0
        width = self.width
        mask = (1 << width) - 1
        for lvl in range(len(self.levels)):
            pos = i * width
            w, sh = pos >> 6, pos & 63
            lw = self._words_int[lvl]
            chunk = lw[w] >> sh
            if sh and sh + width > 64:
                chunk |= lw[w + 1] << (64 - sh)
            v |= (chunk & mask) << shift
            if not self._conts_list[lvl][i]:
                break
            i = self._ranks_list[lvl][i]
            shift += width
        # inverse zigzag, scalar
        return (v >> 1) ^ -(v & 1)

    def scan(self, lo: int, hi: int) -> np.ndarray:
        """Range query [lo, hi): vectorised multi-level gather."""
        idx = np.arange(lo, hi, dtype=np.int64)
        out = np.zeros(len(idx), dtype=np.uint64)
        live = np.arange(len(idx), dtype=np.int64)
        shift = np.uint64(0)
        for lvl in range(len(self.levels)):
            if not len(idx):
                break
            chunks = gather_packed(self._level_words[lvl], self.width, idx, padded=True)
            out[live] |= chunks << shift
            cont = self._conts_bool[lvl][idx]
            idx = self._ranks[lvl][idx[cont]]
            live = live[cont]
            shift += np.uint64(self.width)
        return _unzigzag(out)

    def decompress(self) -> np.ndarray:
        return self.scan(0, self.n)

    @property
    def size_bits(self) -> int:
        return sum(p.size_bits for p in self.levels) + sum(b.size_bits for b in self.conts)


class DACCodec:
    name = "DAC"
    domain = "int"

    def __init__(self, widths=(2, 4, 8, 16)):
        self.widths = widths

    def build(self, values: np.ndarray) -> DAC:
        best = None
        for w in self.widths:
            d = DAC(values, w)
            if best is None or d.size_bits < best.size_bits:
                best = d
        return best

    # stream-codec interface for the generic harness (size via structure)
    def compress(self, values: np.ndarray) -> DAC:
        return self.build(values)
