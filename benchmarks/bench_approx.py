"""Benchmark: Tables F7/F8 — one approximate query per algorithm on the
smallest stand-in (ε=0.3); the full ε-sweep across six datasets is
``jobs/approx_sweep.py``."""
import pytest

from repro.core import build_walk_index, fora, speedppr
from repro.core.resacc import resacc
from repro.experiments.datasets import make_dataset

SCALE = 0.25
EPS = 0.3


@pytest.fixture(scope="module")
def g(spark):
    return make_dataset(spark, "DBLP", SCALE)


@pytest.fixture(scope="module")
def speed_idx(g, tmp_path_factory):
    return build_walk_index(g, str(tmp_path_factory.mktemp("bx") / "s"), policy="speedppr")


@pytest.fixture(scope="module")
def fora_idx(g, tmp_path_factory):
    return build_walk_index(
        g, str(tmp_path_factory.mktemp("bx") / "f"), policy="fora", eps=EPS
    )


@pytest.mark.benchmark(group="approx-query")
def test_bench_fora(benchmark, g):
    res = benchmark.pedantic(lambda: fora(g, 0, eps=EPS, seed=1), rounds=1, iterations=1)
    assert res.pi_vector(g.n).sum() == pytest.approx(1.0, abs=1e-6)


@pytest.mark.benchmark(group="approx-query")
def test_bench_fora_index(benchmark, g, fora_idx):
    res = benchmark.pedantic(
        lambda: fora(g, 0, eps=EPS, seed=2, index=fora_idx), rounds=1, iterations=1
    )
    assert res.pi_vector(g.n).sum() == pytest.approx(1.0, abs=1e-6)


@pytest.mark.benchmark(group="approx-query")
def test_bench_speedppr(benchmark, g):
    res = benchmark.pedantic(lambda: speedppr(g, 0, eps=EPS, seed=3), rounds=1, iterations=1)
    assert res.pi_vector(g.n).sum() == pytest.approx(1.0, abs=1e-6)


@pytest.mark.benchmark(group="approx-query")
def test_bench_speedppr_index(benchmark, g, speed_idx):
    res = benchmark.pedantic(
        lambda: speedppr(g, 0, eps=EPS, seed=4, index=speed_idx), rounds=1, iterations=1
    )
    assert res.pi_vector(g.n).sum() == pytest.approx(1.0, abs=1e-6)


@pytest.mark.benchmark(group="approx-query")
def test_bench_resacc(benchmark, g):
    res = benchmark.pedantic(lambda: resacc(g, 0, eps=EPS, seed=5), rounds=1, iterations=1)
    assert res.pi_vector(g.n).sum() == pytest.approx(1.0, abs=0.05)
