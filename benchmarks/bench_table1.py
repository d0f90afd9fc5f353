"""Benchmark: Table 1 — stand-in dataset generation + statistics.

Regenerates the Table 1 rows (``repro.experiments.table1``); the benchmark
measures end-to-end generation+cleaning cost at a reduced scale so rounds
stay cheap.
"""
import pytest

from repro.experiments.table1 import table1

SCALE = 0.25  # benchmark rounds run at quarter scale; jobs/table1.py is full


@pytest.mark.benchmark(group="table1")
def test_bench_table1(benchmark, spark):
    def run():
        from repro.experiments import datasets

        datasets._CACHE.clear()  # measure real generation, not the memo
        return table1(spark, scale=SCALE)

    df = benchmark.pedantic(run, rounds=1, iterations=1)
    assert len(df) == 6
    assert (df["m"] > 0).all()
