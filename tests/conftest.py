"""Test-local Spark tuning.

The session fixture comes from the repo-root conftest. Tests run on graphs
of a few hundred nodes, where 64 shuffle partitions is pure scheduling
overhead — drop to 8 for the whole test session (runtime-settable conf;
broadcast joins stay disabled as the root conftest configured).
"""
import pytest


@pytest.fixture(scope="session", autouse=True)
def _small_scale_spark(spark):
    # single-task shuffles + no adaptive re-planning: at test scale every
    # superstep is a ~100-row job and scheduling overhead dominates
    spark.conf.set("spark.sql.shuffle.partitions", "1")
    spark.conf.set("spark.sql.adaptive.enabled", "false")
    yield
