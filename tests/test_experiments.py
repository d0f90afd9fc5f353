"""Smoke + shape tests for the dataset stand-ins and table harnesses (at
tiny scale — the full tables are produced by jobs/*.py)."""
import math

import pytest

from repro.experiments import datasets as ds
from repro.experiments.convergence import _pushes_to_reach, convergence_table
from repro.experiments.table1 import table1

SCALE = 0.1


class TestStandIns:
    def test_six_datasets(self):
        assert len(ds.dataset_names()) == 6
        assert set(ds.STAND_INS) == set(ds.PAPER)

    @pytest.mark.parametrize("name", ["DBLP", "Twitter"])
    def test_avg_degree_near_target(self, spark, name):
        g = ds.make_dataset(spark, name, SCALE)
        target = ds.STAND_INS[name].avg_deg
        assert abs(g.avg_degree() - target) / target < 0.30

    def test_type_matches_paper(self, spark):
        g = ds.make_dataset(spark, "DBLP", SCALE)  # undirected
        e = {(r["src"], r["dst"]) for r in g.edges.collect()}
        assert all((b, a) in e for (a, b) in e)

    def test_memoized(self, spark):
        assert ds.make_dataset(spark, "DBLP", SCALE) is ds.make_dataset(spark, "DBLP", SCALE)

    def test_query_sources_deterministic(self, spark):
        g = ds.make_dataset(spark, "DBLP", SCALE)
        assert ds.query_sources(g, 5) == ds.query_sources(g, 5)
        assert len(set(ds.query_sources(g, 5))) == 5


class TestTable1:
    def test_rows_and_columns(self, spark):
        df = table1(spark, scale=SCALE)
        assert list(df["Name"]) == ds.dataset_names()
        assert {"n", "m", "m/n", "Type", "paper n", "paper m"} <= set(df.columns)
        assert (df["m"] / df["n"] - df["m/n"]).abs().max() < 0.01


class TestConvergenceHarness:
    def test_pushes_to_reach(self):
        trace = [(10, 0.5), (20, 0.05), (30, 0.005)]
        assert _pushes_to_reach(trace, 0.1) == 20
        assert math.isnan(_pushes_to_reach(trace, 1e-9))

    def test_table_shape_and_fig6_ordering(self, spark):
        df = convergence_table(spark, ["DBLP"], scale=SCALE)
        assert len(df) == 3
        total = df.set_index("Algorithm")["total pushes/m"]
        # the robust Fig-6 claims: asynchronous pushes (FIFO, PowerPush)
        # beat the global PowItr accounting; PowerPush ≤ FIFO holds only
        # "in most datasets" per the paper, so it is reported, not asserted
        assert total["FIFO-FwdPush"] <= total["PowItr"] * 1.05
        assert total["PowerPush"] <= total["PowItr"] * 1.05
        # all runs reached the λ = min(1e-8, 1/m) target
        assert df["pushes/m @ 1e-08"].notna().all()
