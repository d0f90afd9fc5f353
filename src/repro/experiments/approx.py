"""Tables F7/F8 (the paper's Figures 7/8 as tables) — approximate-SSPPR
query time and actual ℓ1 error versus ε, for FORA, FORA+ (index built at
ε=0.1), SpeedPPR, SpeedPPR-Index and ResAcc, with PowerPush as the
high-precision baseline the paper overlays.

Ground truth per (dataset, source) is the reference PowerPush at λ=1e-12
(the paper uses PowerPush at λ=1e-17 — the highest double precision — for
the same purpose).
"""
from __future__ import annotations

import os
import tempfile
import time

import pandas as pd
from pyspark.sql import SparkSession

from repro.core import build_walk_index, fora, powerpush, speedppr
from repro.core.resacc import resacc
from repro.experiments.datasets import dataset_names, make_dataset, query_sources
from repro.experiments.table2 import FORA_INDEX_EPS
from repro.linalg.exact import l1_error
from repro.linalg.reference import powerpush as ref_powerpush

#: the paper sweeps ε ∈ {0.1..0.5}; the endpoints carry the crossover
#: claims and keep the six-dataset sweep laptop-feasible
EPS_SWEEP_DEFAULT = (0.1, 0.5)


def approx_sweep(
    spark: SparkSession,
    datasets: list[str] | None = None,
    *,
    eps_values: tuple[float, ...] = EPS_SWEEP_DEFAULT,
    n_queries: int = 1,
    scale: float = 1.0,
    include_resacc: bool = True,
    out_dir: str | None = None,
) -> pd.DataFrame:
    """One row per (dataset, ε, algorithm): wall time and actual ℓ1 error."""
    datasets = dataset_names() if datasets is None else datasets
    out_dir = out_dir or tempfile.mkdtemp(prefix="repro_approx_idx_")
    rows = []
    for name in datasets:
        g = make_dataset(spark, name, scale)
        csr = g.to_csr()
        sources = query_sources(g, n_queries)
        truths = {
            s: ref_powerpush(csr, s, lam=1e-12, refine_r_max=1e-12 / g.m)[0] for s in sources
        }
        fora_idx = build_walk_index(
            g, os.path.join(out_dir, f"fora_{name}"), policy="fora", eps=FORA_INDEX_EPS
        )
        speed_idx = build_walk_index(
            g, os.path.join(out_dir, f"speed_{name}"), policy="speedppr"
        )
        # the PowerPush baseline (ε-independent): one high-precision run
        for s in sources:
            t = time.perf_counter()
            res = powerpush(g, s, lam=min(1e-6, 1.0 / g.m))
            rows.append(
                {
                    "Dataset": name, "eps": float("nan"), "Algorithm": "PowerPush",
                    "time (s)": time.perf_counter() - t,
                    "l1 error": l1_error(res.pi_vector(g.n), truths[s]),
                }
            )
        algos = {
            "FORA": lambda g, s, eps: fora(g, s, eps=eps, seed=31),
            "FORA-Index": lambda g, s, eps: fora(g, s, eps=eps, seed=32, index=fora_idx),
            "SpeedPPR": lambda g, s, eps: speedppr(g, s, eps=eps, seed=33),
            "SpeedPPR-Index": lambda g, s, eps: speedppr(g, s, eps=eps, seed=34, index=speed_idx),
        }
        if include_resacc:
            algos["ResAcc"] = lambda g, s, eps: resacc(g, s, eps=eps, seed=35)
        for eps in eps_values:
            for algo, fn in algos.items():
                if algo == "FORA-Index" and eps < FORA_INDEX_EPS:
                    continue  # FORA's index cannot serve a smaller ε
                for s in sources:
                    t = time.perf_counter()
                    res = fn(g, s, eps)
                    wall = time.perf_counter() - t
                    rows.append(
                        {
                            "Dataset": name, "eps": eps, "Algorithm": algo,
                            "time (s)": wall,
                            "l1 error": l1_error(res.pi_vector(g.n), truths[s]),
                        }
                    )
    df = pd.DataFrame(rows)
    return (
        df.groupby(["Dataset", "eps", "Algorithm"], sort=False, dropna=False)
        .mean(numeric_only=True)
        .reset_index()
    )


def print_approx(spark: SparkSession, **kw) -> pd.DataFrame:
    df = approx_sweep(spark, **kw)
    print("\n=== Tables F7/F8 (Figs. 7/8): approx query time and ℓ1 error vs ε ===")
    print(df.to_string(index=False))
    return df
