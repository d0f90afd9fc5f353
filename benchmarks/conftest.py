"""Benchmark-local Spark tuning (mirrors tests/conftest.py: stand-in
graphs are small enough that single-task shuffles win)."""
import pytest


@pytest.fixture(scope="session", autouse=True)
def _bench_spark(spark):
    spark.conf.set("spark.sql.shuffle.partitions", "1")
    spark.conf.set("spark.sql.adaptive.enabled", "false")
    yield
