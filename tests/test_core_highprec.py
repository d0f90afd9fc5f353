"""Tests for the distributed high-precision algorithms (PowItr,
FIFO-FwdPush, SimFwdPush, PowerPush) against the exact ground truth, the
instrumented references, and each other (Lemma 4.1).

Each (algorithm, graph) run is expensive (tens of supersteps), so runs are
computed once in module-scoped fixtures and shared across assertions.
"""
import numpy as np
import pytest

from repro.core import fifo_fwdpush, powerpush, powitr, sim_fwdpush
from repro.graphs.generators import chung_lu, figure1_graph, with_dead_ends
from repro.linalg import reference
from repro.linalg.exact import exact_ppr, l1_error

ALPHA = 0.2


@pytest.fixture(scope="module")
def fig1(spark):
    return figure1_graph(spark)


@pytest.fixture(scope="module")
def cl(spark):
    return chung_lu(spark, n=120, avg_deg=5.0, seed=31)


@pytest.fixture(scope="module")
def deadg(spark):
    return with_dead_ends(spark, n=50, m=160, n_dead=6, seed=13)


# ---------------------------- shared runs -----------------------------
@pytest.fixture(scope="module")
def powitr_fig1(fig1):
    return powitr(fig1, 0, lam=1e-4)


@pytest.fixture(scope="module")
def powitr_cl(cl):
    return powitr(cl, 3, lam=1e-3)


@pytest.fixture(scope="module")
def fifo_cl(cl):
    return fifo_fwdpush(cl, 0, lam=1e-3)


@pytest.fixture(scope="module")
def fifo_fig1(fig1):
    return fifo_fwdpush(fig1, 0, lam=1e-4)


@pytest.fixture(scope="module")
def sim_fig1(fig1):
    return sim_fwdpush(fig1, 0, lam=1e-3)


@pytest.fixture(scope="module")
def sim_cl(cl):
    return sim_fwdpush(cl, 0, lam=1e-3)


@pytest.fixture(scope="module")
def pp_fig1(fig1):
    return powerpush(fig1, 0, lam=1e-5)


@pytest.fixture(scope="module")
def pp_cl(cl):
    return powerpush(cl, 0, lam=1e-3)


@pytest.fixture(scope="module")
def pp_cl_refined(cl):
    return powerpush(cl, 0, lam=1e-3, refine_r_max=1e-3 / cl.m)


class TestDistributedPowItr:
    def test_matches_exact(self, fig1, powitr_fig1):
        truth = exact_ppr(fig1.to_csr(), 0, ALPHA)
        assert l1_error(powitr_fig1.pi_vector(fig1.n), truth) <= 1e-4

    def test_matches_reference_impl(self, cl, powitr_cl):
        pi_ref, r_ref, _ = reference.powitr(cl.to_csr(), 3, ALPHA, 1e-3)
        assert np.allclose(powitr_cl.pi_vector(cl.n), pi_ref, atol=1e-12)
        assert np.allclose(powitr_cl.r_vector(cl.n), r_ref, atol=1e-12)

    def test_residual_geometric(self, powitr_fig1):
        assert powitr_fig1.stats["r_sum"] == pytest.approx(
            (1 - ALPHA) ** powitr_fig1.stats["iterations"], rel=1e-9
        )

    def test_dead_end_graph(self, deadg):
        res = powitr(deadg, 2, lam=1e-3)
        truth = exact_ppr(deadg.to_csr(), 2, ALPHA)
        assert l1_error(res.pi_vector(deadg.n), truth) <= 1e-3

    def test_mass_conservation(self, fig1, powitr_fig1):
        total = powitr_fig1.pi_vector(fig1.n).sum() + powitr_fig1.r_vector(fig1.n).sum()
        assert total == pytest.approx(1.0, abs=1e-12)


class TestDistributedFwdPush:
    def test_residual_bound(self, cl, fifo_cl):
        lam = 1e-3
        csr = cl.to_csr()
        r = fifo_cl.r_vector(cl.n)
        assert (r <= csr.effective_degrees() * (lam / cl.m) + 1e-15).all()
        assert fifo_cl.stats["r_sum"] <= lam

    def test_matches_exact(self, fig1, fifo_fig1):
        truth = exact_ppr(fig1.to_csr(), 0, ALPHA)
        assert l1_error(fifo_fig1.pi_vector(fig1.n), truth) <= 1e-4

    def test_dead_end_graph(self, deadg):
        res = fifo_fwdpush(deadg, 1, lam=1e-3)
        truth = exact_ppr(deadg.to_csr(), 1, ALPHA)
        assert l1_error(res.pi_vector(deadg.n), truth) <= 1e-3

    def test_mass_conservation(self, cl, fifo_cl):
        total = fifo_cl.pi_vector(cl.n).sum() + fifo_cl.r_vector(cl.n).sum()
        assert total == pytest.approx(1.0, abs=1e-12)

    def test_terminates_with_inactive_frontier(self, fifo_fig1):
        assert fifo_fig1.stats["supersteps"] >= 3
        assert fifo_fig1.stats["edge_pushes"] > 0


class TestLemma41Distributed:
    def test_sim_fwdpush_equals_powitr(self, fig1, sim_fig1):
        b = powitr(fig1, 0, lam=1e-3)
        assert np.allclose(sim_fig1.pi_vector(fig1.n), b.pi_vector(fig1.n), atol=1e-14)
        assert np.allclose(sim_fig1.r_vector(fig1.n), b.r_vector(fig1.n), atol=1e-14)

    def test_sim_fwdpush_matches_reference(self, cl, sim_cl):
        pi_ref, r_ref, _ = reference.sim_fwdpush(cl.to_csr(), 0, ALPHA, 1e-3)
        assert np.allclose(sim_cl.pi_vector(cl.n), pi_ref, atol=1e-12)
        assert np.allclose(sim_cl.r_vector(cl.n), r_ref, atol=1e-12)


class TestDistributedPowerPush:
    def test_l1_error_tight(self, fig1, pp_fig1):
        truth = exact_ppr(fig1.to_csr(), 0, ALPHA)
        assert pp_fig1.stats["r_sum"] <= 1e-5 + 1e-15
        assert l1_error(pp_fig1.pi_vector(fig1.n), truth) <= 1e-5

    def test_on_scale_free(self, cl, pp_cl):
        truth = exact_ppr(cl.to_csr(), 0, ALPHA)
        assert l1_error(pp_cl.pi_vector(cl.n), truth) <= 1e-3

    def test_dead_end_graph(self, deadg):
        res = powerpush(deadg, 0, lam=1e-3)
        truth = exact_ppr(deadg.to_csr(), 0, ALPHA)
        assert l1_error(res.pi_vector(deadg.n), truth) <= 1e-3

    def test_refinement_inactive_state(self, cl, pp_cl_refined):
        r_max = 1e-3 / cl.m
        r = pp_cl_refined.r_vector(cl.n)
        assert (r <= cl.to_csr().effective_degrees() * r_max + 1e-15).all()

    def test_mass_conservation(self, fig1, pp_fig1):
        total = pp_fig1.pi_vector(fig1.n).sum() + pp_fig1.r_vector(fig1.n).sum()
        assert total == pytest.approx(1.0, abs=1e-12)

    def test_dynamic_thresholds_cut_edge_pushes(self, sim_cl, pp_cl):
        """The paper's Fig-6 claim: PowerPush needs no more residue
        updates than the rigid push-everything schedule (and usually
        fewer). Supersteps may grow — pushes must not."""
        assert pp_cl.stats["edge_pushes"] <= sim_cl.stats["edge_pushes"] * 1.2
