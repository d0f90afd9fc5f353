"""Table F6 (the paper's Figures 5/6 as a table) — machine-independent
convergence: edge pushes (residue updates), in multiples of ``m``, needed
to bring the ℓ1 error under each threshold, per algorithm per dataset.

Uses the instrumented reference implementations at the paper's setting
λ = min{1e-8, 1/m}. The paper's observations that this table must
reproduce: (i) log-error decreases linearly in pushes for all three,
(ii) FIFO-FwdPush's pushes are more effective than PowItr's (asynchrony),
(iii) PowerPush needs the fewest updates (dynamic thresholds).
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession

from repro.experiments.datasets import dataset_names, make_dataset, query_sources
from repro.linalg.reference import fifo_fwdpush, powerpush, powitr

THRESHOLDS = (1e-2, 1e-4, 1e-6, 1e-8)


def _pushes_to_reach(trace: list[tuple[int, float]], target: float) -> float:
    """First cumulative push count at which r_sum ≤ target (np.nan if the
    run never got there)."""
    for pushes, err in trace:
        if err <= target:
            return pushes
    return float("nan")


def convergence_table(
    spark: SparkSession,
    datasets: list[str] | None = None,
    *,
    n_queries: int = 1,
    scale: float = 1.0,
) -> pd.DataFrame:
    datasets = dataset_names() if datasets is None else datasets
    rows = []
    for name in datasets:
        g = make_dataset(spark, name, scale)
        csr = g.to_csr()
        lam = min(1e-8, 1.0 / g.m)
        for s in query_sources(g, n_queries):
            runs = {
                "PowItr": powitr(csr, s, lam=lam)[2],
                "FIFO-FwdPush": fifo_fwdpush(csr, s, lam=lam)[2],
                "PowerPush": powerpush(csr, s, lam=lam)[2],
            }
            for algo, st in runs.items():
                row = {"Dataset": name, "source": s, "Algorithm": algo}
                for thr in THRESHOLDS:
                    row[f"pushes/m @ {thr:g}"] = round(
                        _pushes_to_reach(st.trace, thr) / g.m, 1
                    )
                row["total pushes/m"] = round(st.edge_pushes / g.m, 1)
                row["wall (s)"] = round(st.wall_time, 2)
                rows.append(row)
    df = pd.DataFrame(rows)
    return (
        df.groupby(["Dataset", "Algorithm"], sort=False)
        .mean(numeric_only=True)
        .drop(columns=["source"])
        .reset_index()
    )


def print_convergence(spark: SparkSession, **kw) -> pd.DataFrame:
    df = convergence_table(spark, **kw)
    print("\n=== Table F6 (Figs. 5/6): edge pushes (×m) to reach each ℓ1 error ===")
    print(df.to_string(index=False))
    return df
