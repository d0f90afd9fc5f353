"""Directed-graph substrate for the SSPPR reproduction."""

from repro.graphs.graph import Graph

__all__ = ["Graph"]
