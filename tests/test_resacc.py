"""Tests for ResAcc-lite (the FORA accelerator with source-residue
accumulation)."""
import pytest
from pyspark.sql import functions as F

from repro.core.resacc import resacc
from repro.graphs.generators import chung_lu, with_dead_ends
from repro.linalg.exact import exact_ppr, max_relative_error

ALPHA = 0.2
EPS = 0.3


@pytest.fixture(scope="module")
def cl(spark):
    return chung_lu(spark, n=120, avg_deg=5.0, seed=71)


@pytest.fixture(scope="module")
def cl_run(cl):
    return resacc(cl, 0, eps=EPS, seed=21)


def test_relative_error_guarantee(cl, cl_run):
    truth = exact_ppr(cl.to_csr(), 0, ALPHA)
    assert max_relative_error(cl_run.pi_vector(cl.n), truth, mu=1.0 / cl.n) <= EPS


def test_mass_close_to_one(cl, cl_run):
    # (π̂ + MC)/(1−R_s) is unbiased; realized mass drifts only by MC noise
    assert cl_run.pi_vector(cl.n).sum() == pytest.approx(1.0, abs=0.05)


def test_source_residue_accumulated(cl, cl_run):
    # the source keeps residue (that is the point of the accumulation),
    # and the final estimate accounts for it via the 1/(1−R_s) scaling
    assert cl_run.stats["source_residue"] > 0
    assert cl_run.stats["source_residue"] < 1


def test_source_not_drained(cl, cl_run):
    r_s = cl_run.r.where(F.col("node") == 0).collect()
    assert r_s and r_s[0]["r"] == pytest.approx(cl_run.stats["source_residue"])


def test_with_dead_ends(spark):
    g = with_dead_ends(spark, n=60, m=180, n_dead=8, seed=72)
    truth = exact_ppr(g.to_csr(), 0, ALPHA)
    res = resacc(g, 0, eps=EPS, seed=22)
    assert max_relative_error(res.pi_vector(g.n), truth, mu=1.0 / g.n) <= EPS


def test_fewer_walks_than_fora(cl, cl_run):
    from repro.core import fora

    f = fora(cl, 0, eps=EPS, seed=23)
    # the source's residue is handled deterministically, so ResAcc needs
    # no more sampled walks than FORA
    assert cl_run.stats["walks_used"] <= f.stats["walks_used"] * 1.05
