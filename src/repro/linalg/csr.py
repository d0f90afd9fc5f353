"""A minimal CSR out-adjacency matrix built on numpy.

Stores only the structure (``indptr``/``indices``) of a directed graph's
out-adjacency; every edge has weight 1 and the transition matrix ``P`` is
row-stochastic (``1/deg`` per out-edge). Dead ends are rows with an empty
range — consumers apply the paper's jump-to-source rule explicitly.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np


@dataclass(frozen=True)
class CSR:
    """Compressed sparse row adjacency of a directed graph on ``n`` nodes."""

    n: int
    indptr: np.ndarray  # int64, len n+1
    indices: np.ndarray  # int64, len m; out-neighbours of i are indices[indptr[i]:indptr[i+1]]

    @staticmethod
    def from_edges(n: int, src: np.ndarray, dst: np.ndarray) -> "CSR":
        """Build from (already deduplicated) edge arrays."""
        src = np.asarray(src, dtype=np.int64)
        dst = np.asarray(dst, dtype=np.int64)
        order = np.lexsort((dst, src))
        src, dst = src[order], dst[order]
        counts = np.bincount(src, minlength=n)
        indptr = np.zeros(n + 1, dtype=np.int64)
        np.cumsum(counts, out=indptr[1:])
        return CSR(n=n, indptr=indptr, indices=dst)

    @property
    def m(self) -> int:
        return int(self.indices.size)

    def out_degrees(self) -> np.ndarray:
        """True out-degrees (0 for dead ends)."""
        return np.diff(self.indptr)

    def effective_degrees(self) -> np.ndarray:
        """Out-degrees under the dead-end rule (dead ends count 1: the
        virtual edge back to the source)."""
        d = np.diff(self.indptr)
        return np.where(d == 0, 1, d)

    def dead_mask(self) -> np.ndarray:
        return np.diff(self.indptr) == 0

    def edge_rows(self) -> np.ndarray:
        """Row id of every stored edge (``len == m``) — enables
        edge-parallel scatter kernels."""
        return np.repeat(np.arange(self.n, dtype=np.int64), np.diff(self.indptr))

    # ------------------------------------------------------------------
    # Kernels
    # ------------------------------------------------------------------
    def push_step(self, r: np.ndarray, alpha: float, s: int) -> np.ndarray:
        """One full simultaneous push of the residue vector ``r``:
        returns ``(1-α)·r·P`` with the dead-end mass routed to ``s``.

        This is the SimFwdPush / PowItr iteration kernel (Eq. 8).
        """
        d = self.effective_degrees()
        out = np.zeros(self.n, dtype=np.float64)
        rows = self.edge_rows()
        contrib = ((1.0 - alpha) * r / d)[rows]
        np.add.at(out, self.indices, contrib)
        dead = self.dead_mask()
        if dead.any():
            out[s] += (1.0 - alpha) * r[dead].sum()
        return out

    def dense_transition(self, s: int) -> np.ndarray:
        """Dense row-stochastic ``P`` (n×n) with dead ends → ``s``.

        Only for small test graphs / the exact ground-truth solver.
        """
        d = self.effective_degrees()
        P = np.zeros((self.n, self.n), dtype=np.float64)
        rows = self.edge_rows()
        P[rows, self.indices] = 1.0 / d[rows]
        for v in np.flatnonzero(self.dead_mask()):
            P[v, s] = 1.0
        return P
