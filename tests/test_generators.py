"""Tests for the synthetic graph generators (dataset stand-in machinery)."""
import numpy as np
import pytest
from pyspark.sql import functions as F

from repro.graphs.generators import (
    chung_lu,
    erdos_renyi,
    figure1_graph,
    ring,
    with_dead_ends,
)


class TestChungLu:
    def test_size_targets(self, spark):
        g = chung_lu(spark, n=400, avg_deg=8.0, seed=1)
        assert 350 <= g.n <= 400
        assert abs(g.m / g.n - 8.0) / 8.0 < 0.25

    def test_deterministic_in_seed(self, spark):
        g1 = chung_lu(spark, n=150, avg_deg=5.0, seed=9)
        g2 = chung_lu(spark, n=150, avg_deg=5.0, seed=9)
        assert g1.n == g2.n and g1.m == g2.m
        e1 = set(map(tuple, g1.edges.collect()))
        e2 = set(map(tuple, g2.edges.collect()))
        assert e1 == e2

    def test_seed_changes_graph(self, spark):
        g1 = chung_lu(spark, n=150, avg_deg=5.0, seed=9)
        g2 = chung_lu(spark, n=150, avg_deg=5.0, seed=10)
        e1 = set(map(tuple, g1.edges.collect()))
        e2 = set(map(tuple, g2.edges.collect()))
        assert e1 != e2

    def test_skewed_degrees(self, spark):
        # scale-free: max degree far above average
        g = chung_lu(spark, n=400, avg_deg=6.0, seed=2)
        dmax = g.degrees.agg(F.max("deg")).collect()[0][0]
        assert dmax > 4 * g.avg_degree()

    def test_undirected_symmetric(self, spark):
        g = chung_lu(spark, n=200, avg_deg=6.0, seed=3, directed=False)
        e = {(r["src"], r["dst"]) for r in g.edges.collect()}
        assert all((b, a) in e for (a, b) in e)
        assert g.dead_ends().count() == 0


class TestErdosRenyi:
    def test_size(self, spark):
        g = erdos_renyi(spark, n=300, m=1200, seed=4)
        assert abs(g.m - 1200) <= 60

    def test_no_self_loops_or_dupes(self, spark):
        g = erdos_renyi(spark, n=100, m=500, seed=5)
        assert g.edges.where(F.col("src") == F.col("dst")).count() == 0
        assert g.edges.distinct().count() == g.m


class TestDeterministicGraphs:
    def test_ring(self, spark):
        g = ring(spark, n=12)
        assert g.n == 12 and g.m == 12
        degs = {r["deg"] for r in g.degrees.collect()}
        assert degs == {1}

    def test_figure1_structure(self, spark):
        g = figure1_graph(spark)
        csr = g.to_csr()
        adj = {v: sorted(csr.indices[csr.indptr[v] : csr.indptr[v + 1]].tolist()) for v in range(5)}
        assert adj == {0: [1, 2], 1: [0, 2, 3, 4], 2: [1, 3], 3: [0, 1, 4], 4: [0, 2]}


class TestWithDeadEnds:
    def test_dead_count(self, spark):
        g = with_dead_ends(spark, n=50, m=150, n_dead=8, seed=1)
        assert g.dead_ends().count() == 8
        assert g.n == 50

    def test_dead_ends_have_in_edges(self, spark):
        g = with_dead_ends(spark, n=50, m=150, n_dead=8, seed=1)
        dead = [r["node"] for r in g.dead_ends().collect()]
        in_deg = (
            g.edges.groupBy(F.col("dst").alias("node")).count()
            .where(F.col("node").isin(dead))
            .count()
        )
        assert in_deg == 8
