"""Tests for the instrumented single-machine reference algorithms.

These are the ground-level claims of the paper:

* PowItr's ℓ1 error is exactly (1−α)^{iters} (Eq. 6);
* SimFwdPush ≡ PowItr (Lemma 4.1);
* FwdPush's residual bound ‖π̂−π‖₁ = r_sum ≤ m·r_max (Eq. 7);
* mass conservation ‖π̂‖₁ + r_sum = 1 throughout;
* FIFO-FwdPush's push count grows like m·log(1/λ), not m/λ (Theorem 4.3);
* PowerPush matches everyone's answers at the same λ.
"""
import numpy as np
import pytest

from repro.graphs.generators import chung_lu, figure1_graph, with_dead_ends
from repro.linalg.exact import exact_ppr, l1_error
from repro.linalg.reference import fifo_fwdpush, powerpush, powitr, sim_fwdpush

ALPHA = 0.2


@pytest.fixture(scope="module")
def graphs(spark):
    return {
        "fig1": figure1_graph(spark).to_csr(),
        "cl": chung_lu(spark, n=150, avg_deg=5.0, seed=11).to_csr(),
        "dead": with_dead_ends(spark, n=60, m=200, n_dead=8, seed=4).to_csr(),
    }


@pytest.mark.parametrize("name", ["fig1", "cl", "dead"])
class TestPowItr:
    def test_l1_error_bound(self, graphs, name):
        csr = graphs[name]
        lam = 1e-6
        pi, r, st = powitr(csr, 0, ALPHA, lam)
        truth = exact_ppr(csr, 0, ALPHA)
        assert l1_error(pi, truth) <= lam

    def test_residual_exactly_geometric(self, graphs, name):
        csr = graphs[name]
        pi, r, st = powitr(csr, 0, ALPHA, 1e-4)
        # Eq. 6: after j iterations r_sum = (1-α)^j
        assert r.sum() == pytest.approx((1 - ALPHA) ** st.iterations, rel=1e-9)

    def test_mass_conservation(self, graphs, name):
        csr = graphs[name]
        pi, r, _ = powitr(csr, 0, ALPHA, 1e-5)
        assert pi.sum() + r.sum() == pytest.approx(1.0, abs=1e-12)


@pytest.mark.parametrize("name", ["fig1", "cl", "dead"])
class TestLemma41Equivalence:
    def test_sim_fwdpush_equals_powitr(self, graphs, name):
        csr = graphs[name]
        pi1, r1, st1 = powitr(csr, 0, ALPHA, 1e-6)
        pi2, r2, st2 = sim_fwdpush(csr, 0, ALPHA, 1e-6)
        assert np.allclose(pi1, pi2, atol=1e-14)
        assert np.allclose(r1, r2, atol=1e-14)
        assert st1.iterations == st2.iterations

    def test_sim_fwdpush_charges_fewer_pushes(self, graphs, name):
        # local accounting ≤ global accounting, strictly fewer early on
        csr = graphs[name]
        _, _, st1 = powitr(csr, 0, ALPHA, 1e-6)
        _, _, st2 = sim_fwdpush(csr, 0, ALPHA, 1e-6)
        assert st2.edge_pushes <= st1.edge_pushes


@pytest.mark.parametrize("name", ["fig1", "cl", "dead"])
class TestFIFOFwdPush:
    def test_residual_bound_eq7(self, graphs, name):
        csr = graphs[name]
        lam = 1e-5
        r_max = lam / csr.m
        pi, r, _ = fifo_fwdpush(csr, 0, ALPHA, r_max=r_max)
        d_eff = csr.effective_degrees()
        assert (r <= d_eff * r_max + 1e-15).all()
        assert r.sum() <= csr.m * r_max + 1e-12

    def test_l1_error_vs_truth(self, graphs, name):
        csr = graphs[name]
        lam = 1e-6
        pi, _, _ = fifo_fwdpush(csr, 0, ALPHA, r_max=lam / csr.m)
        assert l1_error(pi, exact_ppr(csr, 0, ALPHA)) <= lam

    def test_mass_conservation(self, graphs, name):
        csr = graphs[name]
        pi, r, _ = fifo_fwdpush(csr, 0, ALPHA, r_max=1e-7 / csr.m)
        assert pi.sum() + r.sum() == pytest.approx(1.0, abs=1e-12)

    def test_underestimate(self, graphs, name):
        csr = graphs[name]
        pi, _, _ = fifo_fwdpush(csr, 0, ALPHA, r_max=1e-5 / csr.m)
        truth = exact_ppr(csr, 0, ALPHA)
        assert (pi <= truth + 1e-12).all()


class TestTheorem43Scaling:
    def test_pushes_grow_logarithmically_in_lambda(self, graphs):
        """Theorem 4.3: cost ~ m·log(1/λ). Under the old O(m/λ) reading,
        halving λ would double the pushes; here it must add ~a constant
        number of pushes per λ-decade instead."""
        csr = graphs["cl"]
        lams = [1e-2, 1e-4, 1e-6, 1e-8]
        pushes = []
        for lam in lams:
            _, _, st = fifo_fwdpush(csr, 0, ALPHA, r_max=lam / csr.m)
            pushes.append(st.edge_pushes)
        # per-decade increments roughly constant (log behaviour):
        incs = np.diff(pushes)
        assert incs[1] < 2.5 * incs[0] + csr.m
        assert incs[2] < 2.5 * incs[0] + csr.m
        # and nowhere near the 100× blowup an O(m/λ) law would give
        assert pushes[-1] < 50 * pushes[0]

    def test_pushes_scale_with_m(self, spark):
        small = chung_lu(spark, n=100, avg_deg=4.0, seed=20).to_csr()
        big = chung_lu(spark, n=400, avg_deg=4.0, seed=21).to_csr()
        _, _, st_s = fifo_fwdpush(small, 0, ALPHA, r_max=1e-6 / small.m)
        _, _, st_b = fifo_fwdpush(big, 0, ALPHA, r_max=1e-6 / big.m)
        ratio = st_b.edge_pushes / st_s.edge_pushes
        assert ratio < 10 * (big.m / small.m)


@pytest.mark.parametrize("name", ["fig1", "cl", "dead"])
class TestPowerPush:
    def test_l1_error(self, graphs, name):
        csr = graphs[name]
        lam = 1e-6
        pi, r, _ = powerpush(csr, 0, ALPHA, lam)
        assert r.sum() <= lam + 1e-15
        assert l1_error(pi, exact_ppr(csr, 0, ALPHA)) <= lam

    def test_mass_conservation(self, graphs, name):
        csr = graphs[name]
        pi, r, _ = powerpush(csr, 0, ALPHA, 1e-7)
        assert pi.sum() + r.sum() == pytest.approx(1.0, abs=1e-12)

    def test_refinement_reaches_inactive_state(self, graphs, name):
        csr = graphs[name]
        r_max = 1e-5 / csr.m
        pi, r, _ = powerpush(csr, 0, ALPHA, 1e-5, refine_r_max=r_max)
        assert (r <= csr.effective_degrees() * r_max + 1e-15).all()

    def test_fewer_pushes_than_powitr(self, graphs, name):
        csr = graphs[name]
        _, _, st_pp = powerpush(csr, 0, ALPHA, 1e-8)
        _, _, st_pi = powitr(csr, 0, ALPHA, 1e-8)
        assert st_pp.edge_pushes <= st_pi.edge_pushes


class TestTraces:
    def test_traces_monotone(self, graphs):
        csr = graphs["cl"]
        for fn in (powitr, sim_fwdpush):
            _, _, st = fn(csr, 0, ALPHA, 1e-6)
            pushes = [p for p, _ in st.trace]
            errs = [e for _, e in st.trace]
            assert pushes == sorted(pushes)
            assert all(a >= b - 1e-15 for a, b in zip(errs, errs[1:]))

    def test_powitr_trace_matches_eq6(self, graphs):
        csr = graphs["cl"]
        _, _, st = powitr(csr, 0, ALPHA, 1e-4)
        for j, (_, rs) in enumerate(st.trace, start=1):
            assert rs == pytest.approx((1 - ALPHA) ** j, rel=1e-9)
