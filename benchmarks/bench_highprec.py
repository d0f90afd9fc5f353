"""Benchmark: Table F4 — high-precision query time (PowItr vs
FIFO-FwdPush vs PowerPush vs BePI) on the smallest stand-in at reduced
scale and λ=1e-4 (distributed supersteps are scheduling-bound; the full
sweep is ``jobs/highprec_time.py``)."""
import pytest

from repro.bepi import bepi_query, build_bepi_index
from repro.core import fifo_fwdpush, powerpush, powitr
from repro.experiments.datasets import make_dataset

SCALE = 0.25
LAM = 1e-4


@pytest.fixture(scope="module")
def g(spark):
    return make_dataset(spark, "DBLP", SCALE)


@pytest.fixture(scope="module")
def bepi_idx(g):
    return build_bepi_index(g)


@pytest.mark.benchmark(group="highprec-query")
def test_bench_powitr(benchmark, g):
    res = benchmark.pedantic(lambda: powitr(g, 0, lam=LAM), rounds=1, iterations=1)
    assert res.stats["r_sum"] <= LAM


@pytest.mark.benchmark(group="highprec-query")
def test_bench_fifo_fwdpush(benchmark, g):
    res = benchmark.pedantic(lambda: fifo_fwdpush(g, 0, lam=LAM), rounds=1, iterations=1)
    assert res.stats["r_sum"] <= LAM


@pytest.mark.benchmark(group="highprec-query")
def test_bench_powerpush(benchmark, g):
    res = benchmark.pedantic(lambda: powerpush(g, 0, lam=LAM), rounds=1, iterations=1)
    assert res.stats["r_sum"] <= LAM


@pytest.mark.benchmark(group="highprec-query")
def test_bench_bepi_query(benchmark, g, bepi_idx):
    res = benchmark.pedantic(
        lambda: bepi_query(bepi_idx, 0, delta=LAM), rounds=3, iterations=1
    )
    assert res.pi.sum() == pytest.approx(1.0, abs=1e-2)
