"""NeaTS-L: the lossy variant of NeaTS (Section III-B, last paragraph).

Runs Algorithm 1 with ``E = {eps}`` and edge weights equal to the function
parameter bits only (corrections are dropped), producing the space-minimal
piecewise nonlinear eps-approximation.  The output guarantees
``|f(x_k) - y_k| <= eps`` for every point (L-infinity bound).
"""
from __future__ import annotations

import struct

import numpy as np

from .eliasfano import EliasFano
from .models import DEFAULT_FAMILIES, family_by_kind
from .partition import optimal_partition
from .piecewise import Piece

__all__ = ["NeaTSLossy", "lossy_size_bytes", "mape"]


def lossy_size_bytes(n_pieces: int, param_floats: int | list[int], *, kind_bits: int = 2) -> int:
    """Uniform size model for lossy piecewise outputs (used for NeaTS-L, PLA
    and AA alike so ratios are comparable): per piece — parameters as
    float64s, a kind tag, and an amortised Elias-Fano start entry; plus a
    16-byte header.

    ``param_floats`` is either a constant per piece or a per-piece list.
    """
    if isinstance(param_floats, int):
        params_bits = n_pieces * param_floats * 64
    else:
        params_bits = 64 * sum(param_floats)
    start_bits = n_pieces * 32  # EF start + delta, amortised upper bound
    return 16 + (params_bits + start_bits + n_pieces * kind_bits + 7) // 8


def mape(actual: np.ndarray, approx: np.ndarray) -> float:
    """Mean absolute percentage error, skipping zero actual values."""
    actual = np.asarray(actual, dtype=np.float64)
    approx = np.asarray(approx, dtype=np.float64)
    nz = actual != 0
    if not nz.any():
        return 0.0
    return float(np.mean(np.abs((approx[nz] - actual[nz]) / actual[nz]))) * 100.0


class NeaTSLossy:
    """Space-minimal piecewise nonlinear eps-approximation of a series."""

    def __init__(self, pieces: list[Piece], n: int, shift: int, eps: int):
        self.pieces = pieces
        self.n = n
        self.shift = shift
        self.eps = eps

    @classmethod
    def compress(cls, values, eps: int, *, families=None) -> "NeaTSLossy":
        ys = np.asarray(values, dtype=np.int64)
        families = list(DEFAULT_FAMILIES if families is None else families)
        shift = 0
        if any(f.requires_positive for f in families):
            shift = max(0, int(eps + 1 - ys.min()))
        pieces = optimal_partition(ys + shift, families, [int(eps)], lossy=True)
        return cls(pieces, len(ys), shift, int(eps))

    def approximate(self) -> np.ndarray:
        """The lossy reconstruction (float64), error <= eps per point."""
        out = np.empty(self.n, dtype=np.float64)
        for p in self.pieces:
            fam = family_by_kind(p.kind)
            xs = np.arange(p.delta + 1, p.delta + len(p) + 1, dtype=np.float64)
            out[p.start:p.end] = fam.evaluate(p.params, xs)
        return out - self.shift

    @property
    def size_bytes(self) -> int:
        per_piece = [family_by_kind(p.kind).n_params for p in self.pieces]
        return lossy_size_bytes(len(self.pieces), per_piece)

    def max_error(self, values) -> float:
        return float(np.max(np.abs(self.approximate() - np.asarray(values, dtype=np.float64))))
