"""Bipartite graph substrate: local edge-array container + Spark interop."""
from repro.graph.bipartite import BipartiteGraph  # noqa: F401
