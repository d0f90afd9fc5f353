"""Shared machinery for the distributed SSPPR algorithms.

Vectors over nodes are sparse DataFrames ``(node: long, <col>: double)``;
zero coordinates are simply absent. One *push superstep* over the
degree-annotated adjacency ``adj = (src, dst, deg)`` computes

    msgs(dst) = Σ_{(src,dst) ∈ E, src pushed} (1−α) · r(src) / deg(src)

— the distributed form of Eq. (8). Lineage is truncated with eager
``localCheckpoint`` every superstep (the vectors are small; the edge
relation is the big, cached side).
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np
from pyspark.sql import DataFrame
from pyspark.sql import functions as F


@dataclass
class PPRResult:
    """Output of a distributed SSPPR run."""

    pi: DataFrame  # (node, pi) — the reserve / estimate vector, sparse
    r: DataFrame  # (node, r) — the residue vector, sparse
    stats: dict = field(default_factory=dict)

    def pi_vector(self, n: int) -> np.ndarray:
        return _to_dense(self.pi, n, "pi")

    def r_vector(self, n: int) -> np.ndarray:
        return _to_dense(self.r, n, "r")


def _to_dense(df: DataFrame, n: int, col: str) -> np.ndarray:
    out = np.zeros(n, dtype=np.float64)
    pdf = df.toPandas()
    if len(pdf):
        out[pdf["node"].to_numpy(np.int64)] = pdf[col].to_numpy(np.float64)
    return out


def empty_vec(spark, col: str) -> DataFrame:
    return spark.createDataFrame([], f"node long, {col} double")


def unit_vec(spark, node: int, col: str) -> DataFrame:
    return spark.createDataFrame([(int(node), 1.0)], f"node long, {col} double")


def vec_add(a: DataFrame, b: DataFrame, col: str) -> DataFrame:
    """Sparse vector sum (union + re-aggregate)."""
    return (
        a.select("node", col)
        .unionByName(b.select("node", col))
        .groupBy("node")
        .agg(F.sum(col).alias(col))
    )


def vec_scale(a: DataFrame, factor: float, col: str) -> DataFrame:
    return a.select("node", (F.col(col) * F.lit(factor)).alias(col))


def push_msgs(frontier: DataFrame, adj: DataFrame, alpha: float) -> DataFrame:
    """Messages produced by pushing every node in ``frontier`` (node, r):
    each out-neighbour receives ``(1−α)·r/deg``. Returns sparse (node, r)."""
    return (
        frontier.join(adj, frontier["node"] == adj["src"])
        .select(
            F.col("dst").alias("node"),
            ((1.0 - alpha) * F.col("r") / F.col("deg")).alias("r"),
        )
        .groupBy("node")
        .agg(F.sum("r").alias("r"))
    )


def materialize(df: DataFrame) -> DataFrame:
    """Eager localCheckpoint: cuts lineage and caches the (small) vector.

    Vectors hold at most n rows; collapsing to one partition first makes
    the checkpoint and every downstream join/aggregate a single-task job.
    """
    return df.coalesce(1).localCheckpoint(eager=True)


def split_active(r: DataFrame, degrees_q: DataFrame, r_max: float) -> tuple[DataFrame, DataFrame]:
    """Partition the residue vector into (active, inactive) w.r.t. the
    paper's activity rule ``r(s,v) > d_v · r_max``."""
    joined = r.join(degrees_q, "node")
    active = joined.where(F.col("r") > F.col("deg") * F.lit(r_max)).select("node", "r")
    inactive = joined.where(F.col("r") <= F.col("deg") * F.lit(r_max)).select("node", "r")
    return active, inactive


def frontier_stats(r: DataFrame, degrees_q: DataFrame, r_max: float) -> tuple[float, int, int]:
    """One action returning ``(r_sum, #active nodes, Σ deg over active)``."""
    row = (
        r.join(degrees_q, "node")
        .agg(
            F.sum("r").alias("rs"),
            F.sum(F.when(F.col("r") > F.col("deg") * F.lit(r_max), 1).otherwise(0)).alias("na"),
            F.sum(F.when(F.col("r") > F.col("deg") * F.lit(r_max), F.col("deg")).otherwise(0)).alias("da"),
        )
        .collect()[0]
    )
    return float(row["rs"] or 0.0), int(row["na"] or 0), int(row["da"] or 0)
