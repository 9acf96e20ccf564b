"""Measurement harness: adapters, losslessness verification, metrics."""
import numpy as np
import pytest

from repro.harness import ALL_LOSSLESS, build_adapter, measure
from repro.tsdata import load


class TestAdapters:
    def test_all_thirteen_codecs_present(self):
        assert len(ALL_LOSSLESS) == 13  # 5 general + 8 special-purpose
        assert ALL_LOSSLESS[-1] == "NeaTS"

    @pytest.mark.parametrize("name", ALL_LOSSLESS)
    def test_adapter_builds(self, name):
        assert build_adapter(name).name == name

    def test_unknown_raises(self):
        with pytest.raises(ValueError):
            build_adapter("gzip2000")

    def test_variant_adapters(self):
        assert build_adapter("LeaTS").name == "LeaTS"
        assert build_adapter("SNeaTS").name == "SNeaTS"

    @pytest.mark.parametrize("name", ["Gorilla", "Chimp", "Chimp128", "TSXor", "ALP"])
    def test_float_domain_codecs_get_bits(self, name):
        ts = load("CT", n=64)
        values = build_adapter(name).input_of(ts)
        assert values.dtype in (np.uint64, np.float64)

    @pytest.mark.parametrize("name", ["Xz", "DAC", "LeCo", "NeaTS"])
    def test_int_domain_codecs_get_ints(self, name):
        ts = load("CT", n=64)
        assert build_adapter(name).input_of(ts).dtype == np.int64


class TestMeasure:
    @pytest.mark.parametrize("name", ["Zstd", "LeCo", "SNeaTS", "DAC"])
    def test_measures_are_sane(self, name):
        ts = load("DP", n=1200)
        m = measure(name, ts, n_access=50)
        assert 0 < m.ratio_pct < 120
        assert m.compress_mb_s > 0
        assert m.decompress_mb_s > 0
        assert m.random_access_mb_s > 0
        assert m.dataset == "DP"

    def test_verification_catches_corruption(self):
        """measure() must detect a codec that is not lossless."""
        ts = load("CT", n=600)

        class Broken:
            name = "Broken"
            domain = "int"

            def compress(self, values):
                return values[:-1].tobytes()

            def decompress(self, blob):
                return np.frombuffer(blob, dtype=np.int64)

        from repro.harness import _BlockwiseAdapter
        import repro.harness as H

        orig = H.build_adapter
        try:
            H.build_adapter = lambda n: _BlockwiseAdapter(Broken(), "int")
            with pytest.raises(AssertionError, match="not lossless"):
                H.measure("Broken", ts, n_access=5)
        finally:
            H.build_adapter = orig
