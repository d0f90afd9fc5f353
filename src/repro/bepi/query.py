"""BePI-lite query: iterative block elimination over the persisted index.

Solves ``H₀·y = α·e_s`` with ``H₀ = I − (1−α)P₀ᵀ`` via

* back-substitution on the block-diagonal non-hub part
  (``x1 = H11⁻¹(b1 + M12·x2)`` — per-block dense-inverse applications), and
* the fixed-point hub iteration
  ``x2 ← b2 + M21·H11⁻¹·(b1 + M12·x2) + M22·x2``, whose iteration matrix
  has 1-norm ≤ (1−α) (a hub-to-hub no-stop excursion probability), so it
  contracts geometrically — BePI's use of PowItr instead of inverting the
  hub block.

The stop rule is BePI's: ℓ2 distance between consecutive hub iterates
≤ Δ. As the paper notes (§8.1), this does **not** certify the ℓ1 error
against the ground truth — our experiments measure that gap.

Dead ends (zeroed rows of ``P₀``) are repaired exactly by the rank-1
source correction ``x = y / (1 − (1−α)·Σ_dead y / α)`` (Sherman–Morrison
with the dead-mass re-injection at ``s``; derivation in DESIGN.md §5).
"""
from __future__ import annotations

import time
from dataclasses import dataclass, field

import numpy as np

from repro.bepi.index import BepiIndex, coo_matvec


@dataclass
class BepiQueryResult:
    pi: np.ndarray
    iterations: int
    deltas: list[float] = field(default_factory=list)
    wall_time: float = 0.0
    #: after each hub iteration: the full-vector estimate's time/op cost
    ops_per_iter: int = 0


def _apply_h11_inv(idx: BepiIndex, v: np.ndarray) -> np.ndarray:
    out = np.empty_like(v)
    for sl, inv in zip(idx.block_slices(), idx.inverses):
        out[sl] = inv @ v[sl]
    return out


def bepi_query(
    idx: BepiIndex,
    s: int,
    *,
    delta: float = 1e-8,
    max_iters: int = 500,
) -> BepiQueryResult:
    """Answer an SSPPR query from the index; ``delta`` is BePI's Δ."""
    t0 = time.perf_counter()
    alpha = idx.alpha
    n1, n2 = len(idx.nonhub), len(idx.hubs)
    b = np.zeros(idx.n)
    b[s] = alpha
    b1 = b[idx.nonhub] if n1 else np.zeros(0)
    b2 = b[idx.hubs] if n2 else np.zeros(0)

    u1 = _apply_h11_inv(idx, b1) if n1 else b1
    c2 = b2 + coo_matvec(idx.m21, u1, n2)

    x2 = np.zeros(n2)
    deltas: list[float] = []
    iters = 0
    w1 = np.zeros(n1)
    for iters in range(1, max_iters + 1):
        t1 = coo_matvec(idx.m12, x2, n1)
        w1 = _apply_h11_inv(idx, t1)
        x2_new = c2 + coo_matvec(idx.m21, w1, n2) + coo_matvec(idx.m22, x2, n2)
        d = float(np.linalg.norm(x2_new - x2))
        deltas.append(d)
        x2 = x2_new
        if d <= delta:
            break
    x1 = u1 + _apply_h11_inv(idx, coo_matvec(idx.m12, x2, n1)) if n1 else u1

    y = np.zeros(idx.n)
    if n1:
        y[idx.nonhub] = x1
    if n2:
        y[idx.hubs] = x2
    # exact dead-end repair (rank-1 correction)
    if idx.dead.size:
        dmass = float(y[idx.dead].sum())
        denom = 1.0 - (1.0 - alpha) * dmass / alpha
        y = y / denom
    ops = (
        idx.m12[0].size + idx.m21[0].size + idx.m22[0].size
        + int(sum(sz * sz for sz in idx.block_sizes))
    )
    return BepiQueryResult(
        pi=y,
        iterations=iters,
        deltas=deltas,
        wall_time=time.perf_counter() - t0,
        ops_per_iter=ops,
    )
