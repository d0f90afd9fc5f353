"""Table F4 (the paper's Figure 4 as a table) — average high-precision
query time per dataset for PowItr, FIFO-FwdPush, PowerPush (distributed)
and BePI (indexed; its build cost is *not* counted, as in the paper).

The paper runs λ = min{1e-8, 1/m} over 30 sources; distributed supersteps
are scheduling-bound at stand-in scale, so the default here is λ=1e-6 and
fewer sources (configurable) — the machine-independent op-count view of
the same comparison is Table F6 (:mod:`repro.experiments.convergence`).
"""
from __future__ import annotations

import time

import pandas as pd
from pyspark.sql import SparkSession

from repro.bepi import bepi_query, build_bepi_index
from repro.core import fifo_fwdpush, powerpush, powitr
from repro.experiments.datasets import dataset_names, make_dataset, query_sources

#: Figure 4's headline ratios (algorithm time / PowerPush time), read off
#: the paper's bar labels, for the shape diff in EXPERIMENTS.md
PAPER_RATIOS = {
    "DBLP": {"PowItr": 2.3, "FIFO-FwdPush": 2.4, "BePI": 0.9},
    "Web-St": {"PowItr": 2.8, "FIFO-FwdPush": 3.0, "BePI": 2.5},
    "Pokec": {"PowItr": 2.2, "FIFO-FwdPush": 2.5, "BePI": 2.9},
    "LJ": {"PowItr": 2.4, "FIFO-FwdPush": 2.6, "BePI": 3.2},
    "Orkut": {"PowItr": 2.8, "FIFO-FwdPush": 3.1, "BePI": 17.0},
    "Twitter": {"PowItr": 2.3, "FIFO-FwdPush": 2.7, "BePI": 4.0},
}


def highprec_times(
    spark: SparkSession,
    datasets: list[str] | None = None,
    *,
    lam: float = 1e-6,
    n_queries: int = 1,
    scale: float = 1.0,
) -> pd.DataFrame:
    """Average wall time (s) per algorithm per dataset + ratios vs PowerPush."""
    datasets = dataset_names() if datasets is None else datasets
    rows = []
    for name in datasets:
        g = make_dataset(spark, name, scale)
        sources = query_sources(g, n_queries)
        lam_eff = min(lam, 1.0 / g.m)
        bepi_idx = build_bepi_index(g)
        times: dict[str, float] = {"PowItr": 0.0, "FIFO-FwdPush": 0.0, "PowerPush": 0.0, "BePI": 0.0}
        for s in sources:
            t = time.perf_counter()
            powitr(g, s, lam=lam_eff)
            times["PowItr"] += time.perf_counter() - t
            t = time.perf_counter()
            fifo_fwdpush(g, s, lam=lam_eff)
            times["FIFO-FwdPush"] += time.perf_counter() - t
            t = time.perf_counter()
            powerpush(g, s, lam=lam_eff)
            times["PowerPush"] += time.perf_counter() - t
            t = time.perf_counter()
            bepi_query(bepi_idx, s, delta=lam_eff)
            times["BePI"] += time.perf_counter() - t
        avg = {k: v / len(sources) for k, v in times.items()}
        row = {"Dataset": name, "lambda": lam_eff}
        for k, v in avg.items():
            row[f"{k} (s)"] = round(v, 3)
        for k in ("PowItr", "FIFO-FwdPush", "BePI"):
            row[f"{k}/PowerPush"] = round(avg[k] / avg["PowerPush"], 2)
            row[f"paper {k}/PowerPush"] = PAPER_RATIOS[name][k]
        rows.append(row)
    return pd.DataFrame(rows)


def print_highprec(spark: SparkSession, **kw) -> pd.DataFrame:
    df = highprec_times(spark, **kw)
    print("\n=== Table F4 (Fig. 4): High-precision query time ===")
    print(df.to_string(index=False))
    return df
