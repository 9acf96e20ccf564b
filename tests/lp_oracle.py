"""Independent brute-force oracle for the feasibility of segment stabbing.

A line ``l(t) = m*t + b`` stabs every vertical segment ``(t_k, lo_k, hi_k)``
iff (pairwise-slope criterion, a 2D Helly argument on the half-planes
``alpha_k <= t_k*m + b <= omega_k``):

    max_{i<j} (lo_j - hi_i)/(t_j - t_i)  <=  min_{i<j} (hi_j - lo_i)/(t_j - t_i)

This O(n^2) check is used only in tests, as a reference for the
O(1)-amortised hull algorithm in ``repro.core.convex``.
"""
from __future__ import annotations

__all__ = ["feasible", "longest_prefix", "slope_range"]


def slope_range(segments) -> tuple[float, float]:
    """Return (slope_min, slope_max) of the feasible lines; empty if min > max."""
    smin, smax = float("-inf"), float("inf")
    for j in range(len(segments)):
        tj, loj, hij = segments[j]
        for i in range(j):
            ti, loi, hii = segments[i]
            dt = tj - ti
            smin = max(smin, (loj - hii) / dt)
            smax = min(smax, (hij - loi) / dt)
    return smin, smax


def feasible(segments, tol: float = 0.0) -> bool:
    """True iff some line stabs every ``(t, lo, hi)`` segment (within tol)."""
    if any(lo > hi for _, lo, hi in segments):
        return False
    smin, smax = slope_range(segments)
    return smin <= smax + tol


def longest_prefix(segments, tol: float = 0.0) -> int:
    """Length of the longest feasible prefix of ``segments``."""
    for j in range(1, len(segments) + 1):
        if not feasible(segments[:j], tol):
            return j - 1
    return len(segments)
