"""Benchmark: Table F6 — the op-count convergence harness (reference
implementations at λ = min{1e-8, 1/m}), on two stand-ins at reduced
scale. The assertions pin the paper's Fig-6 ordering: PowerPush needs the
fewest residue updates, PowItr the most."""
import pytest

from repro.experiments.convergence import convergence_table

SCALE = 0.25


@pytest.mark.benchmark(group="convergence")
def test_bench_convergence_table(benchmark, spark):
    df = benchmark.pedantic(
        lambda: convergence_table(spark, ["DBLP", "Twitter"], scale=SCALE),
        rounds=1,
        iterations=1,
    )
    assert set(df["Algorithm"]) == {"PowItr", "FIFO-FwdPush", "PowerPush"}
    for name, grp in df.groupby("Dataset"):
        total = grp.set_index("Algorithm")["total pushes/m"]
        # robust Fig-6 claims (PowerPush ≤ FIFO only holds "in most
        # datasets" per the paper, so it is reported, not asserted)
        assert total["FIFO-FwdPush"] <= total["PowItr"] * 1.05
        assert total["PowerPush"] <= total["PowItr"] * 1.05
