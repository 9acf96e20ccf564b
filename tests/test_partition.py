"""Algorithm 1: optimal DAG partitioning."""
import numpy as np
import pytest

from repro.core.bitstream import bits_for_signed
from repro.core.models import DEFAULT_FAMILIES, Linear, family_by_kind
from repro.core.partition import (
    FRAGMENT_OVERHEAD_BITS, default_epsilons, optimal_partition, select_pairs,
)


def _series(seed, n=800):
    rng = np.random.default_rng(seed)
    t = np.arange(n)
    y = 3000 * np.sin(t / 70) + 0.8 * t + rng.normal(0, 6, n)
    y = y - y.min() + 1000
    return y.astype(np.int64)


def _modelled_bits(pieces):
    total = 0
    for p in pieces:
        fam = family_by_kind(p.kind)
        cb = bits_for_signed(p.eps) if p.eps > 0 else 0
        total += len(p) * cb + fam.param_bits + FRAGMENT_OVERHEAD_BITS
    return total


class TestOptimalPartition:
    @pytest.mark.parametrize("seed", range(5))
    def test_cover_contiguous(self, seed):
        ys = _series(seed)
        pieces = optimal_partition(ys, DEFAULT_FAMILIES, [0, 2, 8, 32])
        assert pieces[0].start == 0 and pieces[-1].end == len(ys)
        for a, b in zip(pieces, pieces[1:]):
            assert a.end == b.start

    @pytest.mark.parametrize("seed", range(5))
    def test_eps_bound_per_piece(self, seed):
        ys = _series(seed)
        for p in optimal_partition(ys, DEFAULT_FAMILIES, [0, 2, 8, 32]):
            fam = family_by_kind(p.kind)
            xs = np.arange(p.delta + 1, p.delta + len(p) + 1, dtype=np.float64)
            err = np.max(np.abs(fam.evaluate(p.params, xs) - ys[p.start:p.end]))
            assert err <= p.eps + 1e-6

    def test_full_family_no_worse_than_linear_only(self):
        """The DAG over a superset of edges cannot yield a longer path."""
        ys = _series(1)
        eps = [0, 2, 8, 32]
        full = _modelled_bits(optimal_partition(ys, DEFAULT_FAMILIES, eps))
        lin = _modelled_bits(optimal_partition(ys, [Linear()], eps))
        assert full <= lin

    def test_more_epsilons_no_worse(self):
        ys = _series(2)
        small = _modelled_bits(optimal_partition(ys, [Linear()], [8]))
        big = _modelled_bits(optimal_partition(ys, [Linear()], [0, 2, 8, 32, 128]))
        assert big <= small

    def test_lossy_mode_single_eps(self):
        ys = _series(3)
        pieces = optimal_partition(ys, DEFAULT_FAMILIES, [50], lossy=True)
        assert pieces[-1].end == len(ys)
        for p in pieces:
            assert p.eps == 50

    def test_single_value(self):
        pieces = optimal_partition(np.asarray([7], dtype=np.int64), [Linear()], [0])
        assert len(pieces) == 1 and len(pieces[0]) == 1

    def test_two_values(self):
        pieces = optimal_partition(np.asarray([7, 9], dtype=np.int64), [Linear()], [0])
        assert pieces[-1].end == 2

    def test_empty(self):
        assert optimal_partition(np.asarray([], dtype=np.int64), [Linear()], [0]) == []

    def test_constant_series_one_fragment(self):
        ys = np.full(1000, 5, dtype=np.int64)
        pieces = optimal_partition(ys, [Linear()], [0])
        assert len(pieces) == 1

    def test_suffix_edges_produce_deltas(self):
        """On data with an abrupt regime change, some chosen fragment is a
        suffix of a maximal one (delta > 0) at least occasionally; and any
        delta respects the original fit domain."""
        rng = np.random.default_rng(0)
        ys = np.concatenate([
            (10 * np.arange(300) + rng.integers(-2, 3, 300)),
            (5000 - 7 * np.arange(300) + rng.integers(-2, 3, 300)),
        ]).astype(np.int64)
        pieces = optimal_partition(ys, DEFAULT_FAMILIES, [0, 2, 8])
        for p in pieces:
            assert p.delta >= 0


class TestDefaultEpsilons:
    def test_includes_zero_and_powers(self):
        ys = np.asarray([0, 1000], dtype=np.int64)
        eps = default_epsilons(ys, step_bits=1)
        assert eps[0] == 0
        assert all(e & (e - 1) == 0 for e in eps[1:])
        assert max(eps) <= 1024

    def test_max_bits_cap(self):
        ys = np.asarray([0, 2**40], dtype=np.int64)
        eps = default_epsilons(ys, max_bits=10)
        assert max(eps) < 2**10


class TestSelectPairs:
    def test_returns_subset(self):
        ys = _series(4, n=2000)
        fams, eps, keep = select_pairs(ys, DEFAULT_FAMILIES, [0, 2, 8, 32])
        assert 0 < len(keep) <= 5
        kinds = {f.kind for f in DEFAULT_FAMILIES}
        assert all(k in kinds for k, _ in keep)
        assert all(e in [0, 2, 8, 32] for _, e in keep)
        assert len(fams) >= 1 and len(eps) >= 1
