"""Distributed (PySpark DataFrame) SSPPR algorithms.

Pregel-style supersteps on DataFrames: a residue vector is a sparse
``(node, r)`` relation; one push superstep is a join with the degree-
annotated edge relation followed by a group-by-destination sum. GraphX is
JVM-only, so this package *is* the iterative-message-passing substrate.
"""

from repro.core.common import PPRResult
from repro.core.fora import fora
from repro.core.fwdpush import fifo_fwdpush, sim_fwdpush
from repro.core.montecarlo import monte_carlo, num_walks
from repro.core.powerpush import powerpush
from repro.core.powitr import powitr
from repro.core.speedppr import speedppr
from repro.core.walk_index import WalkIndex, build_walk_index

__all__ = [
    "PPRResult",
    "powitr",
    "fifo_fwdpush",
    "sim_fwdpush",
    "powerpush",
    "monte_carlo",
    "num_walks",
    "fora",
    "speedppr",
    "WalkIndex",
    "build_walk_index",
]
