"""Graph substrate: connected components over an edge DataFrame."""
from repro.graph.components import connected_components

__all__ = ["connected_components"]
