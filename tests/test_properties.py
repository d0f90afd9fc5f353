"""Hypothesis property tests over random small graphs (pure numpy — the
reference implementations and exact solver need no Spark).

Invariants checked on arbitrary graphs, with and without dead ends:

* mass conservation ``‖π̂‖₁ + r_sum = 1`` for every push-style algorithm;
* the FwdPush residual bound (Eq. 7) and the resulting ℓ1 guarantee;
* Lemma 4.1 equivalence SimFwdPush ≡ PowItr;
* the exact solver returns a probability distribution satisfying Eq. (1).
"""
import numpy as np
import pytest
from hypothesis import given, settings, strategies as st

from repro.linalg.csr import CSR
from repro.linalg.exact import exact_ppr, l1_error
from repro.linalg.reference import fifo_fwdpush, powerpush, powitr, sim_fwdpush

ALPHA = 0.2


@st.composite
def graphs(draw):
    """A random directed graph as (CSR, source): 4–20 nodes, dedup edges,
    no self-loops, every node referenced (may include dead ends)."""
    n = draw(st.integers(4, 20))
    pairs = draw(
        st.sets(
            st.tuples(st.integers(0, n - 1), st.integers(0, n - 1)).filter(
                lambda p: p[0] != p[1]
            ),
            min_size=n,  # enough edges that most nodes participate
            max_size=4 * n,
        )
    )
    src = np.array([p[0] for p in pairs], dtype=np.int64)
    dst = np.array([p[1] for p in pairs], dtype=np.int64)
    csr = CSR.from_edges(n, src, dst)
    s = draw(st.integers(0, n - 1))
    return csr, s


@settings(max_examples=30, deadline=None)
@given(graphs())
def test_exact_is_distribution_and_fixed_point(gs):
    csr, s = gs
    pi = exact_ppr(csr, s, ALPHA)
    assert pi.sum() == pytest.approx(1.0, abs=1e-10)
    assert (pi >= -1e-12).all()
    P = csr.dense_transition(s)
    e = np.zeros(csr.n)
    e[s] = 1.0
    assert np.allclose(pi, ALPHA * e + (1 - ALPHA) * pi @ P, atol=1e-12)


@settings(max_examples=30, deadline=None)
@given(graphs(), st.sampled_from([1e-3, 1e-5, 1e-7]))
def test_fifo_fwdpush_invariants(gs, lam):
    csr, s = gs
    pi, r, _ = fifo_fwdpush(csr, s, ALPHA, r_max=lam / csr.m)
    assert pi.sum() + r.sum() == pytest.approx(1.0, abs=1e-10)
    assert (r <= csr.effective_degrees() * (lam / csr.m) + 1e-14).all()
    assert l1_error(pi, exact_ppr(csr, s, ALPHA)) <= lam + 1e-12


@settings(max_examples=30, deadline=None)
@given(graphs(), st.sampled_from([1e-4, 1e-6]))
def test_powerpush_invariants(gs, lam):
    csr, s = gs
    pi, r, _ = powerpush(csr, s, ALPHA, lam)
    assert pi.sum() + r.sum() == pytest.approx(1.0, abs=1e-10)
    assert r.sum() <= lam + 1e-12
    assert l1_error(pi, exact_ppr(csr, s, ALPHA)) <= lam + 1e-12


@settings(max_examples=30, deadline=None)
@given(graphs())
def test_lemma41_on_random_graphs(gs):
    csr, s = gs
    pi1, r1, st1 = powitr(csr, s, ALPHA, 1e-5)
    pi2, r2, st2 = sim_fwdpush(csr, s, ALPHA, 1e-5)
    assert np.allclose(pi1, pi2, atol=1e-13)
    assert np.allclose(r1, r2, atol=1e-13)


@settings(max_examples=20, deadline=None)
@given(graphs())
def test_underestimates_monotone_in_lambda(gs):
    """A tighter λ can only move the estimate up towards π (pushes only
    ever add reserve mass)."""
    csr, s = gs
    pi_loose, _, _ = powitr(csr, s, ALPHA, 1e-2)
    pi_tight, _, _ = powitr(csr, s, ALPHA, 1e-6)
    assert (pi_tight >= pi_loose - 1e-14).all()
