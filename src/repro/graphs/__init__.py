"""Graph substrate: in-memory graphs, generators, datasets, metrics, Spark layer."""
from repro.graphs.graph import Graph

__all__ = ["Graph"]
