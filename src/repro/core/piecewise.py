"""Piecewise epsilon-approximations (Corollary 1).

Repeatedly applying Theorem 1 from left to right yields, in O(n) time, the
piecewise approximation with the *minimum number of pieces* for one
``(family, eps)`` pair — the greedy longest-fragment argument of the
classic PLA literature carries over unchanged.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np

from .models import Family, FragmentFitter

__all__ = ["Piece", "piecewise_partition", "max_abs_error"]


@dataclass(frozen=True)
class Piece:
    """A fragment [start, end) of the series with its fitted function.

    ``delta`` shifts the evaluation domain: the fragment's j-th value
    (j = 1..len) is approximated by ``family.evaluate(params, j + delta)``.
    Greedy pieces always have ``delta == 0``; Algorithm 1's suffix edges
    reuse a function fitted at an earlier origin and set ``delta > 0``.
    """
    start: int
    end: int
    kind: str
    eps: int
    params: tuple
    delta: int = 0

    def __len__(self) -> int:
        return self.end - self.start


def piecewise_partition(ys: np.ndarray, family: Family, eps: int) -> list[Piece]:
    """Greedy minimum-piece partition of ``ys`` for one (family, eps) pair."""
    n = len(ys)
    pieces: list[Piece] = []
    i = 0
    while i < n:
        f = FragmentFitter(family, eps)
        j = i
        while j < n:
            try:
                ok = f.try_extend(int(ys[j]))
            except ValueError:
                ok = False
            if not ok:
                break
            j += 1
        if j == i:
            raise ValueError(
                f"{family.kind} cannot approximate the single value {ys[i]} "
                f"with eps={eps}; shift the series to satisfy positivity first"
            )
        pieces.append(Piece(i, j, family.kind, eps, f.params()))
        i = j
    return pieces


def evaluate_piece(piece: Piece, family: Family) -> np.ndarray:
    """Approximated values of a piece over its fragment (float64)."""
    xs = np.arange(piece.delta + 1, piece.delta + len(piece) + 1, dtype=np.float64)
    return family.evaluate(piece.params, xs)


def max_abs_error(ys: np.ndarray, pieces: list[Piece], family_of) -> float:
    """Max |f(x_k) - y_k| over the whole series (lossy error check)."""
    worst = 0.0
    for p in pieces:
        approx = evaluate_piece(p, family_of(p.kind))
        worst = max(worst, float(np.max(np.abs(approx - ys[p.start:p.end]))))
    return worst
