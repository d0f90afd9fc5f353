"""Tests for the numpy CSR kernels and the exact PPR ground truth."""
import numpy as np
import pytest

from repro.graphs.generators import chung_lu, figure1_graph, with_dead_ends
from repro.linalg.csr import CSR
from repro.linalg.exact import exact_ppr, l1_error, max_relative_error


@pytest.fixture(scope="module")
def fig1_csr(spark):
    return figure1_graph(spark).to_csr()


class TestCSR:
    def test_from_edges(self):
        csr = CSR.from_edges(3, np.array([0, 0, 2]), np.array([1, 2, 0]))
        assert csr.m == 3
        assert csr.out_degrees().tolist() == [2, 0, 1]
        assert csr.effective_degrees().tolist() == [2, 1, 1]
        assert csr.dead_mask().tolist() == [False, True, False]

    def test_edge_rows(self):
        csr = CSR.from_edges(3, np.array([0, 0, 2]), np.array([1, 2, 0]))
        assert csr.edge_rows().tolist() == [0, 0, 2]

    def test_push_step_row_stochastic(self, fig1_csr):
        r = np.zeros(5)
        r[0] = 1.0
        out = fig1_csr.push_step(r, alpha=0.2, s=0)
        # (1-α)·r·P preserves ℓ1 mass scaled by (1-α)
        assert out.sum() == pytest.approx(0.8)
        assert out[1] == pytest.approx(0.4) and out[2] == pytest.approx(0.4)

    def test_push_step_dead_end_mass_to_source(self):
        csr = CSR.from_edges(2, np.array([0]), np.array([1]))  # node 1 dead
        r = np.array([0.0, 1.0])
        out = csr.push_step(r, alpha=0.2, s=0)
        assert out[0] == pytest.approx(0.8) and out[1] == 0.0

    def test_dense_transition(self, fig1_csr):
        P = fig1_csr.dense_transition(s=0)
        assert np.allclose(P.sum(axis=1), 1.0)
        assert P[0, 1] == pytest.approx(0.5)

    def test_dense_transition_dead_end(self):
        csr = CSR.from_edges(2, np.array([0]), np.array([1]))
        P = csr.dense_transition(s=0)
        assert P[1, 0] == 1.0


class TestExactPPR:
    def test_distribution(self, fig1_csr):
        pi = exact_ppr(fig1_csr, s=0)
        assert pi.sum() == pytest.approx(1.0)
        assert (pi > 0).all()
        # the source retains the α teleport mass plus return flow
        assert pi[0] > 0.2

    def test_satisfies_fixed_point(self, fig1_csr):
        alpha = 0.2
        pi = exact_ppr(fig1_csr, s=0, alpha=alpha)
        P = fig1_csr.dense_transition(s=0)
        e = np.zeros(5)
        e[0] = 1.0
        assert np.allclose(pi, alpha * e + (1 - alpha) * pi @ P, atol=1e-14)

    def test_with_dead_ends_still_distribution(self, spark):
        csr = with_dead_ends(spark, n=40, m=100, n_dead=6, seed=2).to_csr()
        pi = exact_ppr(csr, s=3)
        assert pi.sum() == pytest.approx(1.0)

    def test_source_dependence(self, spark):
        csr = chung_lu(spark, n=60, avg_deg=4.0, seed=6).to_csr()
        assert l1_error(exact_ppr(csr, 0), exact_ppr(csr, 1)) > 1e-6


class TestErrorMeasures:
    def test_l1(self):
        assert l1_error(np.array([0.5, 0.5]), np.array([0.4, 0.6])) == pytest.approx(0.2)

    def test_max_relative_error_thresholds(self):
        truth = np.array([0.5, 0.4, 0.001])
        est = np.array([0.55, 0.4, 0.1])
        # the tiny-π node is excluded by μ
        assert max_relative_error(est, truth, mu=0.01) == pytest.approx(0.1)

    def test_max_relative_error_empty_mask(self):
        assert max_relative_error(np.array([1.0]), np.array([0.0]), mu=0.5) == 0.0
