"""Graph substrate: synthetic generators, the Graph container, partitioning."""

from repro.graphs.generators import GRAPHS, GraphSpec, make_edges, rmat_edges
from repro.graphs.graph import Graph, build_graph, fig1_graph

__all__ = [
    "GRAPHS",
    "GraphSpec",
    "Graph",
    "build_graph",
    "fig1_graph",
    "make_edges",
    "rmat_edges",
]
