"""Table II harness: lossy compression ratios of AA vs PLA vs NeaTS-L.

Per dataset, the error bound follows the paper's protocol (Section IV-B):
the smallest eps — searched over a log grid of fractions of the value
range — such that NeaTS-L compresses better than the lossless NeaTS.  At
that eps we report the compression ratio of AA, PLA and NeaTS-L, the
improvements of NeaTS-L over both, and the Section IV-B prose metrics
(MAPE and compression/decompression speed averages).

Run:  python jobs/table2_lossy.py [--n 16384] [--quick]
"""
from __future__ import annotations

import argparse
import sys

import numpy as np

from repro.runner import dump_json, fan_out, get_spark
from repro.tables import table2_run_dataset
from repro.tsdata import DATASETS

#: Table II reference numbers from the paper (compression ratio %, per dataset)
PAPER_TABLE2 = {
    # dataset: (eps_pct, AA, PLA, NeaTS-L)
    "IT": (1.15e-1, 12.11, 12.07, 11.07),
    "US": (2.40e-3, 7.96, 7.41, 6.99),
    "ECG": (5.43e-2, 15.03, 13.46, 12.97),
    "WD": (6.36e0, 28.09, 26.94, 24.76),
    "AP": (3.08e-3, 21.90, 20.00, 19.17),
    "UK": (9.53e-3, 9.82, 9.21, 8.69),
    "GE": (9.12e-3, 13.95, 12.79, 12.08),
    "LAT": (7.00e-6, 25.40, 23.59, 22.09),
    "LON": (1.40e-5, 19.92, 18.32, 17.26),
    "DP": (6.32e-2, 17.51, 16.89, 15.87),
    "CT": (3.88e0, 16.19, 14.45, 13.92),
    "DU": (6.00e-3, 10.04, 10.32, 9.15),
    "BT": (4.85e-1, 59.62, 61.29, 53.77),
    "BW": (3.16e-3, 52.19, 48.28, 45.01),
    "BM": (1.42e-2, 27.13, 25.32, 23.29),
    "BP": (3.61e-1, 43.05, 41.76, 38.52),
}

_SCHEMA = (
    "dataset string, eps long, eps_pct double, aa double, pla double, neats_l double, "
    "impr_aa double, impr_pla double, mape_aa double, mape_pla double, mape_nl double, "
    "comp_aa double, comp_pla double, comp_nl double, "
    "dec_aa double, dec_pla double, dec_nl double"
)


def run(spark, *, n: int | None = None, datasets=None) -> list[dict]:
    datasets = datasets or DATASETS
    rows = fan_out(spark, datasets, lambda name: table2_run_dataset(name, n), _SCHEMA)
    return sorted((row.asDict() for row in rows), key=lambda r: datasets.index(r["dataset"]))


def print_table(rows: list[dict]) -> None:
    print(f"{'ds':4s} {'eps%':>9s} | {'AA':>6s} {'PLA':>6s} {'NeaTS-L':>8s} | "
          f"{'impr.AA':>7s} {'impr.PLA':>8s} | paper: AA/PLA/NeaTS-L")
    for r in rows:
        p = PAPER_TABLE2.get(r["dataset"])
        paper = f"{p[1]:.2f}/{p[2]:.2f}/{p[3]:.2f}" if p else "-"
        print(f"{r['dataset']:4s} {r['eps_pct']:9.2E} | {r['aa']:6.2f} {r['pla']:6.2f} "
              f"{r['neats_l']:8.2f} | {r['impr_aa']:7.2f} {r['impr_pla']:8.2f} | {paper}")
    avg = lambda k: float(np.mean([r[k] for r in rows]))  # noqa: E731
    print(f"\navg improvement vs AA  : {avg('impr_aa'):6.2f}%   (paper: 11.77%)")
    print(f"avg improvement vs PLA : {avg('impr_pla'):6.2f}%   (paper:  7.02%)")
    print(f"avg MAPE  AA={avg('mape_aa'):.2f}%  NeaTS-L={avg('mape_nl'):.2f}%  PLA={avg('mape_pla'):.2f}%  "
          f"(paper: 2.47 / 2.85 / 4.37)")
    print(f"avg compression MB/s   PLA={avg('comp_pla'):8.2f}  AA={avg('comp_aa'):8.2f}  NeaTS-L={avg('comp_nl'):8.2f}  "
          f"(paper: 123.36 > 63.11 > 18.23)")
    print(f"avg decompression MB/s PLA={avg('dec_pla'):8.2f}  NeaTS-L={avg('dec_nl'):8.2f}  AA={avg('dec_aa'):8.2f}  "
          f"(paper: 2997 > 2561 > 2420)")


def main(argv=None):
    ap = argparse.ArgumentParser()
    ap.add_argument("--n", type=int, default=None, help="points per dataset (default: per-dataset bench size)")
    ap.add_argument("--quick", action="store_true", help="small n for a fast smoke run")
    args = ap.parse_args(argv)
    n = 2048 if args.quick else args.n
    spark = get_spark("table2-lossy")
    rows = run(spark, n=n)
    print_table(rows)
    dump_json("table2.json", rows)
    spark.stop()


if __name__ == "__main__":
    main(sys.argv[1:])
