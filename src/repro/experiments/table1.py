"""Table 1 — dataset statistics after cleaning (n, m, m/n, type)."""
from __future__ import annotations

import pandas as pd
from pyspark.sql import SparkSession

from repro.experiments.datasets import PAPER, STAND_INS, dataset_names, make_dataset


def table1(spark: SparkSession, scale: float = 1.0) -> pd.DataFrame:
    """Realized stand-in statistics next to the paper's Table 1."""
    rows = []
    for name in dataset_names():
        g = make_dataset(spark, name, scale)
        p = PAPER[name]
        rows.append(
            {
                "Name": name,
                "n": g.n,
                "m": g.m,
                "m/n": round(g.m / g.n, 2),
                "Type": "undirected" if not STAND_INS[name].directed else "directed",
                "paper n": p.n,
                "paper m": p.m,
                "paper m/n": p.mn,
                "paper Type": p.type,
            }
        )
    return pd.DataFrame(rows)


def print_table1(spark: SparkSession, scale: float = 1.0) -> pd.DataFrame:
    df = table1(spark, scale)
    print("\n=== Table 1: The Six Datasets (stand-ins vs paper) ===")
    print(df.to_string(index=False))
    return df
