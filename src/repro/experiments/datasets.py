"""The six dataset stand-ins (DESIGN.md §4).

The paper's SNAP graphs are unavailable offline; each stand-in is a
directed Chung–Lu scale-free graph matching the original's *type*
(directed/undirected) and *average degree* ``m/n``, at laptop scale
(paper sizes ranged 0.3M–41.7M nodes / 2.1M–1.47B edges). ``PAPER``
records the original Table 1 statistics for the paper-vs-ours diff in
EXPERIMENTS.md.
"""
from __future__ import annotations

from dataclasses import dataclass

from pyspark.sql import SparkSession

from repro.graphs.generators import chung_lu
from repro.graphs.graph import Graph


@dataclass(frozen=True)
class StandIn:
    name: str
    n: int
    avg_deg: float
    directed: bool
    seed: int


@dataclass(frozen=True)
class PaperStats:
    n: int
    m: int
    mn: float
    type: str


#: generation configs — n chosen so the full table jobs stay laptop-feasible
STAND_INS: dict[str, StandIn] = {
    "DBLP": StandIn("DBLP", 3_200, 6.62, directed=False, seed=101),
    "Web-St": StandIn("Web-St", 2_800, 8.20, directed=True, seed=102),
    "Pokec": StandIn("Pokec", 8_000, 18.8, directed=True, seed=103),
    "LJ": StandIn("LJ", 10_000, 14.1, directed=True, seed=104),
    "Orkut": StandIn("Orkut", 3_000, 76.3, directed=False, seed=105),
    "Twitter": StandIn("Twitter", 4_200, 35.3, directed=True, seed=106),
}

#: the paper's Table 1 (after their cleaning), for side-by-side diffs
PAPER: dict[str, PaperStats] = {
    "DBLP": PaperStats(317_000, 2_100_000, 6.62, "undirected"),
    "Web-St": PaperStats(282_000, 2_310_000, 8.20, "directed"),
    "Pokec": PaperStats(1_630_000, 30_600_000, 18.8, "directed"),
    "LJ": PaperStats(4_850_000, 68_400_000, 14.1, "directed"),
    "Orkut": PaperStats(3_070_000, 234_000_000, 76.3, "undirected"),
    "Twitter": PaperStats(41_700_000, 1_470_000_000, 35.3, "directed"),
}

_CACHE: dict[tuple[str, float], Graph] = {}


def dataset_names() -> list[str]:
    return list(STAND_INS)


def make_dataset(spark: SparkSession, name: str, scale: float = 1.0) -> Graph:
    """Build (and memoize per session) the stand-in graph for ``name``.

    ``scale`` multiplies the node count — used by quick benchmark modes.
    """
    key = (name, scale)
    if key not in _CACHE:
        cfg = STAND_INS[name]
        _CACHE[key] = chung_lu(
            spark,
            n=max(16, int(cfg.n * scale)),
            avg_deg=cfg.avg_deg,
            seed=cfg.seed,
            directed=cfg.directed,
        )
    return _CACHE[key]


def query_sources(g: Graph, k: int, seed: int = 7) -> list[int]:
    """``k`` uniform-random query sources (the paper uses 30)."""
    import numpy as np

    rng = np.random.default_rng(seed)
    return [int(v) for v in rng.choice(g.n, size=min(k, g.n), replace=False)]
