"""Attributed bipartite graph substrate: representations and generators."""
from repro.graph.bipartite import BipartiteGraph

__all__ = ["BipartiteGraph"]
