"""Self-checks for the provided TPC-H-lite generators and the DuckDB
oracle plumbing (kept alongside the graph substrate per the repo charter;
the paper's own workload is graphs)."""
import pytest
from pyspark.sql import functions as F

from repro import synth_data
from repro.oracle import assert_equivalent

SF = 0.002


@pytest.fixture(scope="module")
def li(spark):
    return synth_data.lineitem(spark, sf=SF).cache()


@pytest.fixture(scope="module")
def orders(spark):
    return synth_data.orders(spark, sf=SF).cache()


def test_lineitem_shape(li):
    assert li.count() == int(6_000_000 * SF)
    assert "l_orderkey" in li.columns


def test_generators_deterministic(spark):
    a = synth_data.orders(spark, sf=SF).agg(F.sum("o_totalprice")).collect()[0][0]
    b = synth_data.orders(spark, sf=SF).agg(F.sum("o_totalprice")).collect()[0][0]
    assert a == b


def test_join_aggregate_matches_oracle(spark, li, orders):
    """A shuffle join + aggregation (broadcast disabled session-wide)
    checked against DuckDB — exercises the oracle end to end."""
    q = (
        li.join(orders, li["l_orderkey"] == orders["o_orderkey"])
        .groupBy("o_orderpriority")
        .agg(
            F.count("*").alias("cnt"),
            F.round(F.sum("l_quantity"), 3).alias("qty"),
        )
    )
    assert_equivalent(
        q,
        """
        SELECT o_orderpriority, COUNT(*) AS cnt,
               ROUND(SUM(l_quantity), 3) AS qty
        FROM li JOIN orders ON l_orderkey = o_orderkey
        GROUP BY o_orderpriority
        """,
        li=li,
        orders=orders,
    )


def test_zipf_keys_skew(spark):
    df = synth_data.zipf_keys(spark, n=20_000, n_keys=1000, alpha=1.2)
    top = (
        df.groupBy("k").count().orderBy(F.desc("count")).limit(1).collect()[0]["count"]
    )
    assert top > 20_000 / 1000 * 5  # heaviest key ≫ uniform share
