"""Tests for the Pregel-style connected components substrate."""
import numpy as np
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.graphs import Graph
from repro.graphs.ccomp import connected_components, connected_components_local
from repro.graphs.generators import chung_lu, erdos_renyi, ring
from repro.oracle import assert_equivalent


def _partition(labels_df):
    """comp label → frozenset of nodes (labels are ids, only partition matters)."""
    pdf = labels_df.toPandas()
    return {frozenset(g["node"]) for _, g in pdf.groupby("comp")}


def _partition_local(comp: np.ndarray):
    out = {}
    for v, c in enumerate(comp):
        out.setdefault(c, set()).add(v)
    return {frozenset(s) for s in out.values()}


class TestUnionFindOracle:
    def test_two_components(self):
        comp = connected_components_local(5, np.array([0, 3]), np.array([1, 4]))
        assert comp.tolist() == [0, 0, 2, 3, 3]

    def test_chain(self):
        comp = connected_components_local(4, np.array([0, 1, 2]), np.array([1, 2, 3]))
        assert (comp == 0).all()


@pytest.mark.parametrize(
    "maker",
    [
        lambda s: ring(s, n=33),
        lambda s: erdos_renyi(s, n=120, m=150, seed=8),  # sparse → many comps
        lambda s: chung_lu(s, n=150, avg_deg=3.0, seed=12),
    ],
)
def test_spark_cc_matches_union_find(spark, maker):
    g = maker(spark)
    labels = connected_components(g.edges, g.nodes)
    pdf = g.edges.toPandas()
    comp = connected_components_local(g.n, pdf["src"].to_numpy(), pdf["dst"].to_numpy())
    assert _partition(labels) == _partition_local(comp)


def test_isolated_nodes_get_own_component(spark):
    edges = spark.createDataFrame(pd.DataFrame({"src": [0, 1], "dst": [1, 0]}))
    nodes = spark.range(4).select(F.col("id").alias("node"))
    labels = connected_components(edges, nodes)
    parts = _partition(labels)
    assert frozenset({2}) in parts and frozenset({3}) in parts


def test_cc_labels_cover_all_nodes(spark):
    g = erdos_renyi(spark, n=80, m=100, seed=2)
    labels = connected_components(g.edges, g.nodes)
    assert labels.count() == g.n
    assert labels.select("node").distinct().count() == g.n


def test_single_propagation_step_matches_oracle_sql(spark):
    """One min-label propagation superstep is a plain relational query —
    oracle-check it against DuckDB."""
    g = erdos_renyi(spark, n=60, m=120, seed=3)
    und = g.edges.unionByName(
        g.edges.select(F.col("dst").alias("src"), F.col("src").alias("dst"))
    ).distinct()
    labels = g.nodes.select("node", F.col("node").alias("comp"))
    step = (
        labels.join(
            und.join(labels.withColumnRenamed("node", "dst"), "dst")
            .groupBy(F.col("src").alias("node"))
            .agg(F.min("comp").alias("nmin")),
            "node",
            "left",
        )
        .select("node", F.least("comp", F.coalesce("nmin", "comp")).alias("comp"))
    )
    assert_equivalent(
        step,
        """
        SELECT l.node AS node,
               LEAST(l.comp, COALESCE(m.nmin, l.comp)) AS comp
        FROM (SELECT node, node AS comp FROM nodes) l
        LEFT JOIN (
          SELECT u.src AS node, MIN(l2.comp) AS nmin
          FROM (SELECT src, dst FROM edges
                UNION SELECT dst, src FROM edges) u
          JOIN (SELECT node, node AS comp FROM nodes) l2 ON u.dst = l2.node
          GROUP BY u.src
        ) m USING (node)
        """,
        edges=g.edges,
        nodes=g.nodes,
    )


def test_long_path_component_converges(spark):
    """Path-like components stress pointer doubling (a single jump per
    round stalls; full doubling must converge in O(log n) rounds)."""
    g = ring(spark, n=257)
    labels = connected_components(g.edges, g.nodes)
    assert labels.select("comp").distinct().count() == 1
