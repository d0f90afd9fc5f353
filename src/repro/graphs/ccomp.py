"""Connected components, Pregel-style, on DataFrames.

Used by the BePI baseline's hub-and-spoke decomposition (DESIGN.md §5):
after removing hub nodes, the remaining subgraph's connected components
become the diagonal blocks of ``H11``.

Algorithm: the **alternating large-star / small-star** algorithm (Kiveris
et al., "Connected Components in MapReduce and Beyond"), which converges
in O(log² n) rounds on any graph — unlike plain min-label propagation,
which advances only one cluster-hop per round and stalls on path-like
components, this *rewrites* the edge set each round:

* large-star: every node attaches its strictly-larger neighbours to the
  minimum of its closed neighbourhood;
* small-star: every node attaches its not-larger neighbours (and itself)
  to that minimum.

At the fixpoint every component is a star rooted at its minimum node id.

Implementation notes: each round's edge set is materialized through
pandas (``createDataFrame(toPandas())``) — this both provides an exact
convergence check and resets plan lineage *and statistics* (Spark's
``localCheckpoint`` keeps origin-plan ``sizeInBytes``, whose per-round
self-join products blow up into astronomically large BigIntegers in the
stats visitor). A numpy union-find twin
(:func:`connected_components_local`) is the test oracle and a fast
driver-side option for tiny block graphs.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F


def _canon(e: DataFrame) -> DataFrame:
    """Canonical undirected pair set: (a, b) with a < b, deduplicated."""
    return (
        e.select(F.least("src", "dst").alias("a"), F.greatest("src", "dst").alias("b"))
        .where(F.col("a") != F.col("b"))
        .distinct()
    )


def _large_star(pairs: DataFrame) -> DataFrame:
    """Attach every strictly-larger neighbour to min(closed neighbourhood)."""
    und = pairs.select(F.col("a").alias("u"), F.col("b").alias("v")).unionByName(
        pairs.select(F.col("b").alias("u"), F.col("a").alias("v"))
    )
    mins = und.groupBy("u").agg(F.min("v").alias("mv"))
    mins = mins.select("u", F.least("mv", F.col("u")).alias("m"))
    out = (
        und.join(mins, "u")
        .where(F.col("v") > F.col("u"))
        .select(F.col("v").alias("src"), F.col("m").alias("dst"))
    )
    return _canon(out)


def _small_star(pairs: DataFrame) -> DataFrame:
    """Attach every not-larger neighbour (and self) to min(smaller nbrs)."""
    dirp = pairs.select(F.col("b").alias("u"), F.col("a").alias("v"))  # big → small
    mins = dirp.groupBy("u").agg(F.min("v").alias("m"))
    out = (
        dirp.join(mins, "u")
        .select(F.col("v").alias("src"), F.col("m").alias("dst"))
        .unionByName(mins.select(F.col("u").alias("src"), F.col("m").alias("dst")))
    )
    return _canon(out)


def connected_components(edges: DataFrame, nodes: DataFrame, max_rounds: int = 64) -> DataFrame:
    """Component labels for an *undirected* view of ``edges``.

    ``edges``: (src, dst); ``nodes``: (node,) — every node that must be
    labelled, including isolated ones. Returns ``(node, comp)`` where
    ``comp`` is the minimum node id of the component.
    """
    spark = edges.sparkSession
    pdf = _canon(edges).toPandas().sort_values(["a", "b"]).reset_index(drop=True)
    for _ in range(max_rounds):
        if len(pdf) == 0:
            break
        pairs = spark.createDataFrame(pdf)
        stepped = _small_star(_large_star(pairs))
        new_pdf = stepped.toPandas().sort_values(["a", "b"]).reset_index(drop=True)
        done = new_pdf.equals(pdf)
        pdf = new_pdf
        if done:
            break
    else:
        raise RuntimeError(f"connected_components did not converge in {max_rounds} rounds")

    # fixpoint: stars (b → root a). Every non-root has exactly one edge.
    if len(pdf) == 0:
        labels = nodes.select("node", F.col("node").alias("comp"))
    else:
        star = spark.createDataFrame(pdf)
        labels = (
            nodes.join(
                star.select(F.col("b").alias("node"), F.col("a").alias("root")), "node", "left"
            )
            .select("node", F.coalesce("root", "node").alias("comp"))
        )
    return spark.createDataFrame(labels.toPandas())


def connected_components_local(n: int, src: np.ndarray, dst: np.ndarray) -> np.ndarray:
    """Union-find oracle: ``comp[i]`` = representative (min id) of node i."""
    parent = np.arange(n, dtype=np.int64)

    def find(x: int) -> int:
        root = x
        while parent[root] != root:
            root = parent[root]
        while parent[x] != root:
            parent[x], x = root, int(parent[x])
        return root

    for a, b in zip(np.asarray(src, dtype=np.int64), np.asarray(dst, dtype=np.int64)):
        ra, rb = find(int(a)), find(int(b))
        if ra != rb:
            parent[max(ra, rb)] = min(ra, rb)
    return np.array([find(int(i)) for i in range(n)], dtype=np.int64)
