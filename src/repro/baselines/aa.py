"""Adaptive Approximation (AA) baseline — Xu et al. [30], Qi et al. [31].

AA heuristically partitions a time series using linear, exponential, and
quadratic functions that *pass through the first data point* of each
fragment, leaving one free parameter per family.  For each fragment start
it greedily extends every family (a simple feasible-interval intersection,
which is sub-optimal compared to Theorem 1's two-parameter fit), keeps the
family reaching farthest, and emits that fragment.  This reproduces the
two properties the paper attributes to AA (Section IV-B): more fragments
than NeaTS-L, and zero error at fragment anchors — hence its slightly
better MAPE but worse compression ratio.
"""
from __future__ import annotations

import math
from dataclasses import dataclass

import numpy as np

from ..core.lossy import lossy_size_bytes

__all__ = ["AA"]

_KINDS = ("linear", "quadratic", "exponential")


@dataclass(frozen=True)
class AAPiece:
    start: int
    end: int
    kind: str
    theta: float
    y0: float

    def __len__(self) -> int:
        return self.end - self.start


def _basis(kind: str, dx: float) -> float:
    if kind == "linear":
        return dx
    if kind == "quadratic":
        return dx * dx
    raise AssertionError(kind)


def _extend_anchored(ys: np.ndarray, i: int, eps: float, kind: str) -> tuple[int, float]:
    """Longest fragment from ``i`` for an anchored one-parameter family.

    linear:      f(x) = y0 + theta*(x - x0)
    quadratic:   f(x) = y0 + theta*(x - x0)^2
    exponential: f(x) = y0 * exp(theta*(x - x0))   (needs y0 > 0 and y_k > 0)
    Returns (end_exclusive, theta).
    """
    n = len(ys)
    y0 = float(ys[i])
    lo_t, hi_t = -math.inf, math.inf
    j = i + 1
    if kind == "exponential" and (y0 <= 0 or y0 - eps <= 0):
        return j, 0.0
    while j < n:
        dx = float(j - i)
        yk = float(ys[j])
        if kind == "exponential":
            if yk - eps <= 0:
                break
            lo = math.log((yk - eps) / y0) / dx
            hi = math.log((yk + eps) / y0) / dx
        else:
            base = _basis(kind, dx)
            lo = (yk - eps - y0) / base
            hi = (yk + eps - y0) / base
        nlo, nhi = max(lo_t, lo), min(hi_t, hi)
        if nlo > nhi:
            break
        lo_t, hi_t = nlo, nhi
        j += 1
    if not math.isfinite(lo_t):
        theta = 0.0
    else:
        theta = (lo_t + hi_t) / 2.0
    return j, theta


class AA:
    def __init__(self, pieces: list[AAPiece], n: int, eps: float):
        self.pieces = pieces
        self.n = n
        self.eps = eps

    @classmethod
    def compress(cls, values, eps: float) -> "AA":
        ys = np.asarray(values, dtype=np.float64)
        n = len(ys)
        pieces: list[AAPiece] = []
        i = 0
        while i < n:
            best_end, best_kind, best_theta = i + 1, "linear", 0.0
            for kind in _KINDS:
                end, theta = _extend_anchored(ys, i, float(eps), kind)
                if end > best_end:
                    best_end, best_kind, best_theta = end, kind, theta
            pieces.append(AAPiece(i, best_end, best_kind, best_theta, float(ys[i])))
            i = best_end
        return cls(pieces, n, float(eps))

    def approximate(self) -> np.ndarray:
        out = np.empty(self.n, dtype=np.float64)
        for p in self.pieces:
            dx = np.arange(0, len(p), dtype=np.float64)
            if p.kind == "linear":
                out[p.start:p.end] = p.y0 + p.theta * dx
            elif p.kind == "quadratic":
                out[p.start:p.end] = p.y0 + p.theta * dx * dx
            else:
                out[p.start:p.end] = p.y0 * np.exp(np.minimum(p.theta * dx, 700.0))
        return out

    @property
    def size_bytes(self) -> int:
        return lossy_size_bytes(len(self.pieces), 2)

    def max_error(self, values) -> float:
        return float(np.max(np.abs(self.approximate() - np.asarray(values, dtype=np.float64))))
