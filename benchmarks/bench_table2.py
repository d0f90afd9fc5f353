"""Benchmark: Table 2 — index construction (BePI vs FORA+ vs
SpeedPPR-Index), one benchmark per (system, dataset-pair).

Runs on the two smallest stand-ins at reduced scale so pytest-benchmark
rounds are affordable; the full six-dataset table is ``jobs/table2.py``.
The assertions pin the table's headline shape: SpeedPPR's index is the
smallest and fastest to build; FORA's walk index is the largest.
"""
import pytest

from repro.bepi import build_bepi_index
from repro.core import build_walk_index
from repro.experiments.datasets import make_dataset
from repro.experiments.table2 import FORA_INDEX_EPS

SCALE = 0.25
DATASETS = ["DBLP", "Web-St"]


@pytest.fixture(scope="module", params=DATASETS)
def g(request, spark):
    return make_dataset(spark, request.param, SCALE)


@pytest.mark.benchmark(group="table2-build")
def test_bench_bepi_build(benchmark, g):
    idx = benchmark.pedantic(lambda: build_bepi_index(g), rounds=1, iterations=1)
    assert idx.size_bytes > 0


@pytest.mark.benchmark(group="table2-build")
def test_bench_fora_index_build(benchmark, g, tmp_path):
    idx = benchmark.pedantic(
        lambda: build_walk_index(g, str(tmp_path / "fora"), policy="fora", eps=FORA_INDEX_EPS),
        rounds=1,
        iterations=1,
    )
    assert idx.size_bytes > 0


@pytest.mark.benchmark(group="table2-build")
def test_bench_speedppr_index_build(benchmark, g, tmp_path):
    idx = benchmark.pedantic(
        lambda: build_walk_index(g, str(tmp_path / "speed"), policy="speedppr"),
        rounds=1,
        iterations=1,
    )
    assert idx.size_bytes > 0


def test_table2_shape(spark, tmp_path):
    """The headline Table-2 relations at bench scale: SpeedPPR index ≪
    FORA index in both size and walk count."""
    g = make_dataset(spark, "DBLP", SCALE)
    fora_idx = build_walk_index(g, str(tmp_path / "f"), policy="fora", eps=FORA_INDEX_EPS)
    speed_idx = build_walk_index(g, str(tmp_path / "s"), policy="speedppr")
    assert speed_idx.num_walks_stored < fora_idx.num_walks_stored
    assert speed_idx.size_bytes < fora_idx.size_bytes
