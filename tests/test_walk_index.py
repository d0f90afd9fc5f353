"""Tests for the pre-computed walk index (FORA+ / SpeedPPR-Index)."""
import math

import pytest
from pyspark.sql import functions as F

from repro.core import build_walk_index, num_walks
from repro.core.walk_index import WalkIndex, _capacity_counts
from repro.graphs.generators import chung_lu, with_dead_ends
from repro.oracle import assert_equivalent

EPS = 0.3


@pytest.fixture(scope="module")
def g(spark):
    return chung_lu(spark, n=100, avg_deg=4.0, seed=51)


@pytest.fixture(scope="module")
def gd(spark):
    return with_dead_ends(spark, n=40, m=110, n_dead=6, seed=52)


@pytest.fixture(scope="module")
def speed_idx(g, tmp_path_factory):
    return build_walk_index(g, str(tmp_path_factory.mktemp("wi") / "s"), policy="speedppr", seed=1)


@pytest.fixture(scope="module")
def fora_idx(g, tmp_path_factory):
    return build_walk_index(
        g, str(tmp_path_factory.mktemp("wi") / "f"), policy="fora", eps=EPS, seed=2
    )


class TestCapacityPolicies:
    def test_speedppr_counts_are_effective_degrees(self, gd):
        counts = _capacity_counts(gd, "speedppr", None, None)
        joined = counts.join(gd.degrees, "node").toPandas()
        for _, row in joined.iterrows():
            expected = max(1, row["deg"])
            assert row["K"] == expected

    def test_speedppr_total_at_most_m_plus_deadends(self, gd):
        counts = _capacity_counts(gd, "speedppr", None, None)
        total = counts.agg(F.sum("K")).collect()[0][0]
        n_dead = gd.dead_ends().count()
        assert total == gd.m + n_dead

    def test_fora_counts_formula(self, g):
        counts = _capacity_counts(g, "fora", EPS, None).toPandas()
        W = num_walks(g.n, EPS, 1.0 / g.n)
        factor = math.sqrt(W / g.m)
        degs = {r["node"]: r["deg"] for r in g.degrees.collect()}
        for _, row in counts.iterrows():
            d = max(1, degs[row["node"]])
            assert row["K"] == math.floor(d * factor) + 1

    def test_fora_index_larger_than_speedppr(self, g):
        # W > m here, so √(W/m) > 1 ⇒ FORA stores strictly more walks
        f = _capacity_counts(g, "fora", EPS, None).agg(F.sum("K")).collect()[0][0]
        s = _capacity_counts(g, "speedppr", None, None).agg(F.sum("K")).collect()[0][0]
        assert f > s

    def test_unknown_policy_raises(self, g):
        with pytest.raises(ValueError):
            _capacity_counts(g, "nope", None, None)


class TestBuildAndLoad:
    def test_walks_stored_matches_counts(self, g, speed_idx):
        expected = _capacity_counts(g, "speedppr", None, None).agg(F.sum("K")).collect()[0][0]
        assert speed_idx.num_walks_stored == expected

    def test_walk_idx_ranges(self, g, speed_idx):
        per_node = speed_idx.walks.groupBy("start").agg(
            F.count("*").alias("cnt"), F.max("walk_idx").alias("mx"), F.min("walk_idx").alias("mn")
        )
        bad = per_node.where(
            (F.col("cnt") != F.col("mx")) | (F.col("mn") != 1)
        ).count()
        assert bad == 0

    def test_per_node_counts_match_oracle_sql(self, g, speed_idx):
        per_node = speed_idx.walks.groupBy("start").agg(F.count("*").alias("cnt"))
        assert_equivalent(
            per_node,
            "SELECT start, COUNT(*) AS cnt FROM walks GROUP BY start",
            walks=speed_idx.walks,
        )

    def test_size_and_time_recorded(self, speed_idx, fora_idx):
        assert speed_idx.size_bytes > 0 and fora_idx.size_bytes > 0
        assert speed_idx.build_seconds > 0

    def test_load_roundtrip(self, g, speed_idx):
        loaded = WalkIndex.load(g.spark, speed_idx.path, policy="speedppr")
        assert loaded.num_walks_stored == speed_idx.num_walks_stored
        assert loaded.size_bytes == speed_idx.size_bytes

    def test_endpoints_in_range(self, g, speed_idx):
        bad = speed_idx.walks.where(
            (F.col("endpoint") < 0) | (F.col("endpoint") >= g.n)
        ).count()
        assert bad == 0

    def test_pending_implies_dead_end(self, g, speed_idx):
        # directed Chung–Lu graphs legitimately have dead ends (in-edges
        # only); every pending walk must be frozen at one of them
        dead = {r["node"] for r in g.dead_ends().collect()}
        pend = speed_idx.walks.where(F.col("pending")).select("endpoint").collect()
        assert {r["endpoint"] for r in pend}.issubset(dead)

    def test_no_pending_on_undirected_graph(self, spark, tmp_path_factory):
        gu = chung_lu(spark, n=60, avg_deg=4.0, seed=53, directed=False)
        idx = build_walk_index(
            gu, str(tmp_path_factory.mktemp("wi") / "u"), policy="speedppr", seed=4
        )
        assert idx.walks.where(F.col("pending")).count() == 0

    def test_pending_walks_on_dead_end_graph(self, gd, tmp_path_factory):
        idx = build_walk_index(
            gd, str(tmp_path_factory.mktemp("wi") / "d"), policy="speedppr", seed=3
        )
        pend = idx.walks.where(F.col("pending"))
        assert pend.count() > 0
        dead = {r["node"] for r in gd.dead_ends().collect()}
        assert {r["endpoint"] for r in pend.collect()}.issubset(dead)
