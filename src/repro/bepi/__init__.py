"""BePI-lite: the high-precision matrix-based baseline (Jung et al.,
SIGMOD'17), rebuilt from the paper's description (only MATLAB P-code of the
original exists; the SpeedPPR paper itself ran it as a black box).

Structure (DESIGN.md §5): SlashBurn-style hub removal until the non-hub
subgraph's connected components fit a block cap, per-block dense inverses of
``H11 = I − (1−α)P₀ᵀ|₁₁`` built in parallel via ``applyInPandas``, persisted
as an index, and an iterative block-elimination query on the hub part with
BePI's ℓ2-between-iterates stop rule.
"""

from repro.bepi.build import build_bepi_index
from repro.bepi.index import BepiIndex
from repro.bepi.query import bepi_query

__all__ = ["build_bepi_index", "BepiIndex", "bepi_query"]
