"""Table 2 — index size and construction time for the three indexed
systems: BePI (high-precision), FORA+ (ε=0.1) and SpeedPPR-Index."""
from __future__ import annotations

import os
import tempfile

import pandas as pd
from pyspark.sql import SparkSession

from repro.bepi import build_bepi_index
from repro.core import build_walk_index
from repro.experiments.datasets import dataset_names, make_dataset

#: paper's Table 2 (sizes in MB, times in seconds) for the side-by-side diff
PAPER_TABLE2 = {
    #        BePI size  FORA size  Speed size   BePI t   FORA t  Speed t
    "DBLP": (23.9, 139.0, 8.01, 1.72, 6.53, 0.520),
    "Web-St": (31.7, 137.0, 8.82, 1.92, 4.21, 0.489),
    "Pokec": (1130.0, 1240.0, 118.0, 75.4, 248.0, 16.2),
    "LJ": (2320.0, 3310.0, 263.0, 185.0, 612.0, 38.8),
    "Orkut": (54500.0, 4800.0, 894.0, 57988.0, 1410.0, 173.0),
    "Twitter": (24500.0, 47800.0, 5480.0, 6180.0, 19883.0, 1256.0),
}

FORA_INDEX_EPS = 0.1  # the paper builds FORA's index at its smallest ε


def table2(
    spark: SparkSession,
    datasets: list[str] | None = None,
    scale: float = 1.0,
    out_dir: str | None = None,
) -> pd.DataFrame:
    """Build all three indexes per dataset; report bytes and seconds."""
    datasets = dataset_names() if datasets is None else datasets
    out_dir = out_dir or tempfile.mkdtemp(prefix="repro_idx_")
    rows = []
    for name in datasets:
        g = make_dataset(spark, name, scale)
        bepi = build_bepi_index(
            g, path=os.path.join(out_dir, f"bepi_{name}.npz")
        )
        fora_idx = build_walk_index(
            g, os.path.join(out_dir, f"fora_{name}"), policy="fora", eps=FORA_INDEX_EPS
        )
        speed_idx = build_walk_index(
            g, os.path.join(out_dir, f"speed_{name}"), policy="speedppr"
        )
        p = PAPER_TABLE2[name]
        rows.append(
            {
                "Dataset": name,
                "BePI size (MB)": round(bepi.size_bytes / 1e6, 3),
                "FORA size (MB)": round(fora_idx.size_bytes / 1e6, 3),
                "SpeedPPR size (MB)": round(speed_idx.size_bytes / 1e6, 3),
                "BePI time (s)": round(bepi.build_seconds, 2),
                "FORA time (s)": round(fora_idx.build_seconds, 2),
                "SpeedPPR time (s)": round(speed_idx.build_seconds, 2),
                "FORA/Speed size×": round(fora_idx.size_bytes / speed_idx.size_bytes, 1),
                "paper BePI size (MB)": p[0],
                "paper FORA size (MB)": p[1],
                "paper Speed size (MB)": p[2],
                "paper FORA/Speed size×": round(p[1] / p[2], 1),
                "paper BePI time": p[3],
                "paper FORA time": p[4],
                "paper Speed time": p[5],
            }
        )
    return pd.DataFrame(rows)


def print_table2(spark: SparkSession, **kw) -> pd.DataFrame:
    df = table2(spark, **kw)
    print("\n=== Table 2: Index Size and Construction Time ===")
    print(df.to_string(index=False))
    return df
