"""Synthetic dataset generators (paper's 16 series, scaled)."""
import numpy as np
import pytest

from repro.tsdata import DATASETS, TimeSeries, load, load_all

PAPER_DECIMALS = {
    "IT": 2, "US": 2, "ECG": 3, "WD": 2, "AP": 5, "UK": 1, "GE": 3,
    "LAT": 4, "LON": 4, "DP": 3, "CT": 1, "DU": 3, "BT": 9, "BW": 7,
    "BM": 5, "BP": 4,
}


class TestGenerators:
    def test_sixteen_datasets(self):
        assert len(DATASETS) == 16

    @pytest.mark.parametrize("name", DATASETS)
    def test_deterministic(self, name):
        a = load(name, n=500)
        b = load(name, n=500)
        assert np.array_equal(a.ints, b.ints)
        assert np.array_equal(a.floats, b.floats)

    @pytest.mark.parametrize("name", DATASETS)
    def test_seed_changes_data(self, name):
        a = load(name, n=500, seed=1)
        b = load(name, n=500, seed=2)
        assert not np.array_equal(a.ints, b.ints)

    @pytest.mark.parametrize("name", DATASETS)
    def test_decimals_match_paper(self, name):
        assert load(name, n=64).decimals == PAPER_DECIMALS[name]

    @pytest.mark.parametrize("name", DATASETS)
    def test_int_float_consistency(self, name):
        """floats == ints / 10^decimals exactly (the paper's transformation)."""
        ts = load(name, n=500)
        assert np.array_equal(ts.floats, ts.ints / 10.0 ** ts.decimals)

    @pytest.mark.parametrize("name", DATASETS)
    def test_int64_safe(self, name):
        ts = load(name, n=500)
        assert np.abs(ts.ints).max() < 2**62
        # float64 must represent the ints exactly for the fixed-point pipeline
        assert np.abs(ts.ints).max() < 2**53

    def test_requested_size(self):
        assert load("IT", n=123).n == 123

    def test_default_sizes_ordered_like_paper(self):
        """IT is the paper's largest series, BP the smallest."""
        all_ts = load_all(n=None)
        assert all_ts["IT"].n == max(t.n for t in all_ts.values())
        assert all_ts["BP"].n == min(t.n for t in all_ts.values())

    def test_original_bytes(self):
        ts = load("CT", n=100)
        assert ts.original_bytes == 800

    def test_value_range_positive(self):
        for name in DATASETS:
            assert load(name, n=300).value_range > 0


class TestCharacter:
    def test_stocks_are_low_noise(self):
        """Stock series must be far more compressible than Basel sensors
        (the paper's ratio ordering US << BT/BW): the bits needed per
        successive delta — the residual-entropy driver — must differ by a
        wide margin (2 fractional digits vs 9)."""
        us = load("US", n=2000)
        bt = load("BT", n=2000)
        us_bits = np.log2(1 + np.abs(np.diff(us.ints)).mean())
        bt_bits = np.log2(1 + np.abs(np.diff(bt.ints)).mean())
        assert us_bits + 8 < bt_bits

    def test_gps_has_constant_runs(self):
        lat = load("LAT", n=3000)
        diffs = np.diff(lat.ints)
        assert (diffs == 0).mean() > 0.1  # stop segments

    def test_wd_within_degrees(self):
        wd = load("WD", n=2000)
        assert wd.floats.min() >= 0.0 and wd.floats.max() < 360.0

    def test_ecg_is_periodic(self):
        ecg = load("ECG", n=2000)
        x = ecg.floats - ecg.floats.mean()
        ac = np.correlate(x, x, "full")[len(x) - 1:]
        # strong autocorrelation at the 160-sample beat period
        assert ac[160] > 0.5 * ac[0]

    def test_dataclass_fields(self):
        ts = load("BM", n=100)
        assert isinstance(ts, TimeSeries)
        assert ts.ints.dtype == np.int64
        assert ts.floats.dtype == np.float64
