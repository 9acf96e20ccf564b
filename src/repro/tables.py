"""Per-dataset measurement routines for the Table II / Table III harnesses.

These live inside the installed package (not under ``jobs/``) because the
Spark fan-out pickles the functions by reference — executors import them
from ``repro``, which is on every worker's path, whereas ``jobs/`` is not.
"""
from __future__ import annotations

import time

import numpy as np

from .baselines.aa import AA
from .baselines.pla import PLA
from .core.lossy import NeaTSLossy, mape
from .core.neats import NeaTS
from .harness import ALL_LOSSLESS, measure
from .tsdata import load

__all__ = ["pick_eps", "table2_run_dataset", "table3_run_dataset"]


def pick_eps(ints: np.ndarray, lossless_bytes: int) -> int:
    """Smallest eps (log grid over the value range) making NeaTS-L smaller
    than lossless NeaTS — the paper's eps-selection protocol (§IV-B)."""
    rng = int(ints.max() - ints.min())
    for frac in np.logspace(-7, -0.5, 18):
        eps = max(1, int(rng * frac))
        if NeaTSLossy.compress(ints, eps).size_bytes < lossless_bytes:
            return eps
    return max(1, int(rng * 0.3))


def table2_run_dataset(name: str, n: int | None) -> list[dict]:
    """AA vs PLA vs NeaTS-L on one dataset at the protocol-selected eps."""
    ts = load(name, n=n)
    ints = ts.ints
    orig = ts.original_bytes
    lossless = NeaTS.compress(ints, variant="sneats").size_bytes
    eps = pick_eps(ints, lossless)

    t0 = time.perf_counter()
    nl = NeaTSLossy.compress(ints, eps)
    t_nl = time.perf_counter() - t0
    t0 = time.perf_counter()
    pl = PLA.compress(ints, eps)
    t_pl = time.perf_counter() - t0
    t0 = time.perf_counter()
    aa = AA.compress(ints, eps)
    t_aa = time.perf_counter() - t0

    approx, dec_t = {}, {}
    for key, obj in (("nl", nl), ("pla", pl), ("aa", aa)):
        t0 = time.perf_counter()
        approx[key] = obj.approximate()
        dec_t[key] = time.perf_counter() - t0
        err = float(np.max(np.abs(approx[key] - ints)))
        assert err <= eps + 1e-6, (name, key, err, eps)

    mb = orig / 1e6
    r = {
        "dataset": name,
        "eps": int(eps),
        "eps_pct": 100.0 * eps / max(1, ts.value_range),
        "aa": 100.0 * aa.size_bytes / orig,
        "pla": 100.0 * pl.size_bytes / orig,
        "neats_l": 100.0 * nl.size_bytes / orig,
        "mape_aa": mape(ints, approx["aa"]),
        "mape_pla": mape(ints, approx["pla"]),
        "mape_nl": mape(ints, approx["nl"]),
        "comp_aa": mb / t_aa,
        "comp_pla": mb / t_pl,
        "comp_nl": mb / t_nl,
        "dec_aa": mb / dec_t["aa"],
        "dec_pla": mb / dec_t["pla"],
        "dec_nl": mb / dec_t["nl"],
    }
    r["impr_aa"] = 100.0 * (r["aa"] - r["neats_l"]) / r["aa"]
    r["impr_pla"] = 100.0 * (r["pla"] - r["neats_l"]) / r["pla"]
    return [r]


def table3_run_dataset(name: str, n: int | None, n_access: int) -> list[dict]:
    """Run the full 13-codec battery on one dataset."""
    ts = load(name, n=n)
    out = []
    for codec in ALL_LOSSLESS:
        m = measure(codec, ts, n_access=n_access)
        out.append(
            {"dataset": name, "codec": codec, "ratio": m.ratio_pct,
             "comp": m.compress_mb_s, "dec": m.decompress_mb_s,
             "ra": m.random_access_mb_s}
        )
    return out
