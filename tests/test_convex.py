"""SegmentStabber vs the brute-force pairwise-slope oracle."""
import numpy as np
import pytest

from repro.core.convex import SegmentStabber

from tests.lp_oracle import longest_prefix


def _greedy_len(segs):
    s = SegmentStabber()
    got = 0
    for t, lo, hi in segs:
        if not s.add(t, lo, hi):
            break
        got += 1
    return got, s


def _random_segments(seed, *, n_max=40, eps_max=20.0):
    rng = np.random.default_rng(seed)
    n = int(rng.integers(2, n_max))
    ts = np.unique(np.sort(rng.uniform(0, 100, n)))
    ys = rng.normal(0, 10, len(ts)).cumsum()
    eps = float(rng.uniform(0.05, eps_max))
    return [(float(t), float(y - eps), float(y + eps)) for t, y in zip(ts, ys)]


class TestAgainstOracle:
    @pytest.mark.parametrize("seed", range(120))
    def test_longest_prefix_matches_oracle(self, seed):
        segs = _random_segments(seed)
        got, _ = _greedy_len(segs)
        assert got == longest_prefix(segs)

    @pytest.mark.parametrize("seed", range(60))
    def test_solution_stabs_accepted_prefix(self, seed):
        segs = _random_segments(seed)
        got, s = _greedy_len(segs)
        m, b = s.solve()
        scale = 1 + max(abs(b), max(abs(hi) for _, _, hi in segs[:got]))
        for t, lo, hi in segs[:got]:
            v = m * t + b
            assert lo - 1e-9 * scale <= v <= hi + 1e-9 * scale

    @pytest.mark.parametrize("seed", range(40))
    def test_asymmetric_segments(self, seed):
        """lo/hi need not be symmetric around a midpoint (anchored families)."""
        rng = np.random.default_rng(seed + 5000)
        n = int(rng.integers(2, 30))
        ts = np.unique(np.sort(rng.uniform(0, 50, n)))
        lows = rng.normal(0, 5, len(ts))
        his = lows + rng.uniform(0.01, 10, len(ts))
        segs = [(float(t), float(l), float(h)) for t, l, h in zip(ts, lows, his)]
        got, _ = _greedy_len(segs)
        assert got == longest_prefix(segs)


class TestEdgeCases:
    def test_single_point(self):
        s = SegmentStabber()
        assert s.add(1.0, -1.0, 1.0)
        m, b = s.solve()
        assert m == 0.0 and -1.0 <= b <= 1.0

    def test_two_points_always_feasible(self):
        s = SegmentStabber()
        assert s.add(1.0, 100.0, 101.0)
        assert s.add(2.0, -100.0, -99.0)

    def test_empty_segment_raises(self):
        with pytest.raises(ValueError):
            SegmentStabber().add(1.0, 2.0, 1.0)

    def test_non_increasing_t_raises(self):
        s = SegmentStabber()
        s.add(1.0, 0.0, 1.0)
        with pytest.raises(ValueError):
            s.add(1.0, 0.0, 1.0)

    def test_solve_empty_raises(self):
        with pytest.raises(ValueError):
            SegmentStabber().solve()

    def test_rejection_preserves_state(self):
        """After a rejected add the prior solution must stay valid."""
        s = SegmentStabber()
        pts = [(1.0, 0.0, 1.0), (2.0, 1.0, 2.0), (3.0, 2.0, 3.0)]
        for t, lo, hi in pts:
            assert s.add(t, lo, hi)
        assert not s.add(4.0, 100.0, 101.0)  # infeasible
        m, b = s.solve()
        for t, lo, hi in pts:
            assert lo - 1e-9 <= m * t + b <= hi + 1e-9

    def test_exact_line_accepts_everything(self):
        s = SegmentStabber()
        for x in range(1, 200):
            assert s.add(float(x), 2.0 * x + 1 - 0.5, 2.0 * x + 1 + 0.5)
        m, b = s.solve()
        assert abs(m - 2.0) < 0.01
        assert abs(b - 1.0) < 1.0

    def test_long_random_walk_segments_cover(self):
        rng = np.random.default_rng(0)
        ys = rng.normal(0, 1, 2000).cumsum()
        eps = 3.0
        i = 0
        pieces = 0
        while i < len(ys):
            s = SegmentStabber()
            j = i
            while j < len(ys) and s.add(float(j - i + 1), ys[j] - eps, ys[j] + eps):
                j += 1
            assert j > i
            pieces += 1
            i = j
        assert pieces < len(ys) / 4  # eps=3 sigma merges many points
