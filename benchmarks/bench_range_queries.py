"""Figure 4 benchmarks: range-query latency across range sizes.

One benchmark per (codec, range-size); ``jobs/range_queries.py``
regenerates the throughput table.
"""
import numpy as np
import pytest

from repro.baselines.alp import ALPCodec
from repro.baselines.blockstore import BlockStore
from repro.baselines.dac import DACCodec
from repro.baselines.gp import GPCodec
from repro.core.neats import NeaTS
from repro.tsdata import load

N = 4096
RANGES = [10, 160, 2560]


@pytest.fixture(scope="module")
def ts():
    return load("IT", n=N)


@pytest.fixture(scope="module")
def artifacts(ts):
    return {
        "NeaTS": (NeaTS.compress(ts.ints, variant="sneats"), ts.ints),
        "DAC": (DACCodec().build(ts.ints), ts.ints),
        "ALP": (ALPCodec().compress(ts.floats), ts.floats),
        "Lz4": (BlockStore(GPCodec("Lz4"), ts.ints), ts.ints),
    }


@pytest.mark.parametrize("size", RANGES)
@pytest.mark.parametrize("codec", ["NeaTS", "DAC", "ALP", "Lz4"])
def test_bench_range_query(benchmark, artifacts, codec, size):
    art, vals = artifacts[codec]
    rng = np.random.default_rng(size)
    starts = rng.integers(0, N - size, 16)

    def batch():
        for s in starts:
            art.scan(int(s), int(s) + size)

    benchmark.pedantic(batch, rounds=3, iterations=1)
    s = int(starts[0])
    assert np.array_equal(art.scan(s, s + size), vals[s:s + size])
