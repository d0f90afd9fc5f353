"""Synthetic directed-graph generators.

The paper evaluates on six SNAP graphs; those are not available offline, so
the experiments run on *stand-ins* generated here (DESIGN.md §4). All
generators are deterministic in ``seed`` and return cleaned
:class:`~repro.graphs.graph.Graph` objects.

* :func:`chung_lu` — scale-free graphs (power-law in/out weights), the model
  for the six dataset stand-ins; matches the "m = O(n log n)" regime the
  paper's SpeedPPR analysis assumes.
* :func:`erdos_renyi` — uniform random graphs (non-scale-free control).
* :func:`ring`, :func:`figure1_graph` — small deterministic graphs; the
  latter reproduces the paper's Figure 1/2/3 running example exactly.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession

from repro.graphs.graph import Graph


def _powerlaw_weights(n: int, gamma: float) -> np.ndarray:
    """Zipf-style weights ``i^{-1/(γ-1)}`` giving a degree power law with
    exponent γ under Chung–Lu sampling."""
    return np.arange(1, n + 1, dtype=np.float64) ** (-1.0 / (gamma - 1.0))


def _sample_edges(
    rng: np.random.Generator,
    n: int,
    m_target: int,
    w_src: np.ndarray,
    w_dst: np.ndarray,
    oversample: float = 1.6,
) -> tuple[np.ndarray, np.ndarray]:
    """Sample ~``m_target`` distinct non-loop edges with endpoint
    probabilities ∝ the given weights (iid edge sampling + dedup + trim)."""
    k = int(m_target * oversample) + 16
    p_src = w_src / w_src.sum()
    p_dst = w_dst / w_dst.sum()
    src = rng.choice(n, size=k, p=p_src)
    dst = rng.choice(n, size=k, p=p_dst)
    keep = src != dst
    src, dst = src[keep], dst[keep]
    key = src.astype(np.int64) * n + dst
    _, first = np.unique(key, return_index=True)
    first.sort()
    src, dst = src[first], dst[first]
    if src.size > m_target:
        pick = rng.choice(src.size, size=m_target, replace=False)
        pick.sort()
        src, dst = src[pick], dst[pick]
    return src.astype(np.int64), dst.astype(np.int64)


def chung_lu(
    spark: SparkSession,
    *,
    n: int,
    avg_deg: float,
    gamma: float = 2.5,
    seed: int = 0,
    directed: bool = True,
) -> Graph:
    """Scale-free graph with ~``n`` nodes and ~``n*avg_deg`` directed edges.

    For ``directed=False`` an undirected edge set of half the target size is
    sampled and mirrored (the paper's treatment of DBLP/Orkut), so
    ``avg_deg`` is still the *directed* ``m/n`` after mirroring.
    """
    rng = np.random.default_rng(seed)
    w = _powerlaw_weights(n, gamma)
    if directed:
        m_target = int(n * avg_deg)
        # independent permutations decorrelate in- and out-popularity
        w_out = w[rng.permutation(n)]
        w_in = w[rng.permutation(n)]
        src, dst = _sample_edges(rng, n, m_target, w_out, w_in)
        return Graph.from_pandas_edges(spark, src, dst)
    m_target = int(n * avg_deg / 2)
    src, dst = _sample_edges(rng, n, m_target, w, w)
    # canonicalise pairs before dedup-by-construction mirroring
    lo, hi = np.minimum(src, dst), np.maximum(src, dst)
    key = lo * n + hi
    _, first = np.unique(key, return_index=True)
    lo, hi = lo[first], hi[first]
    return Graph.from_pandas_edges(spark, lo, hi, undirected=True)


def erdos_renyi(
    spark: SparkSession, *, n: int, m: int, seed: int = 0, directed: bool = True
) -> Graph:
    """Uniform random graph with ~``m`` distinct directed edges."""
    rng = np.random.default_rng(seed)
    uni = np.ones(n)
    src, dst = _sample_edges(rng, n, m if directed else m // 2, uni, uni)
    if directed:
        return Graph.from_pandas_edges(spark, src, dst)
    return Graph.from_pandas_edges(spark, src, dst, undirected=True)


def ring(spark: SparkSession, *, n: int) -> Graph:
    """Directed cycle 0→1→…→n-1→0 (deterministic; diameter n-1)."""
    src = np.arange(n, dtype=np.int64)
    dst = (src + 1) % n
    return Graph.from_pandas_edges(spark, src, dst)


def figure1_graph(spark: SparkSession) -> Graph:
    """The 5-node graph of the paper's Figures 1–3 running example.

    Out-adjacency (nodes 0-indexed: v1→0 … v5→4), reverse-engineered to
    reproduce *every* number in Figures 2 and 3 with ``s=v1``, ``α=0.2``,
    ``r_max=0.099``:

    * v1→{v2,v3}; v2→{v1,v3,v4,v5}; v3→{v2,v4}; v4→{v1,v2,v5}; v5→{v1,v3}.
    """
    edges = [
        (0, 1), (0, 2),
        (1, 0), (1, 2), (1, 3), (1, 4),
        (2, 1), (2, 3),
        (3, 0), (3, 1), (3, 4),
        (4, 0), (4, 2),
    ]
    pdf = pd.DataFrame(edges, columns=["src", "dst"])
    return Graph.from_edges(spark, pdf)


def with_dead_ends(
    spark: SparkSession, *, n: int, m: int, n_dead: int, seed: int = 0
) -> Graph:
    """Random graph where the last ``n_dead`` node ids have no out-edges —
    exercises the jump-back-to-source rule in every algorithm."""
    rng = np.random.default_rng(seed)
    live = n - n_dead
    assert live >= 2, "need at least two live nodes"
    uni_src = np.concatenate([np.ones(live), np.zeros(n_dead)])
    uni_dst = np.ones(n)
    src, dst = _sample_edges(rng, n, m, uni_src, uni_dst)
    # make sure every dead node is referenced so it survives cleaning, and
    # every live node keeps at least one out-edge (a ring over the live
    # part) so exactly ``n_dead`` nodes are dead ends
    extra_src = rng.integers(0, live, size=n_dead)
    extra_dst = np.arange(live, n, dtype=np.int64)
    ring_src = np.arange(live, dtype=np.int64)
    ring_dst = (ring_src + 1) % live
    src = np.concatenate([src, extra_src, ring_src])
    dst = np.concatenate([dst, extra_dst, ring_dst])
    keep = src != dst
    return Graph.from_pandas_edges(spark, src[keep], dst[keep])
