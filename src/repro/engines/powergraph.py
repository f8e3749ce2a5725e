"""Simulated PowerGraph (Gonzalez et al., OSDI'12).

Synchronous GAS over a random vertex-cut across the 8 simulated nodes:

* **gather** runs for every *signalled* vertex over ALL of its in-edges —
  even when only one in-neighbour changed, the whole neighbourhood is
  re-aggregated. This is the per-vertex computational redundancy the paper
  measures in Table 2;
* **apply + sync**: every value change is replicated to the vertex's
  mirrors, so updates are weighted by the replication factor and each
  change costs ``replicas - 1`` network messages;
* **scatter** signals the out-neighbours of changed vertices.
"""
from __future__ import annotations

import pandas as pd

from repro.engines.base import Engine
from repro.metrics import GAS_COMP_FACTOR
from repro.graphs.graph import Graph
from repro.graphs.partition import vertex_cut_replicas


class PowerGraphEngine(Engine):
    name = "powergraph"
    style = "gas"
    comp_cost_factor = GAS_COMP_FACTOR

    def vertex_statics(self, graph: Graph) -> pd.DataFrame:
        rep = vertex_cut_replicas(graph.edges_pdf(), graph.num_vertices)
        return pd.DataFrame(
            {
                "id": graph.statics["id"],
                "node": graph.statics["id"] % 8,
                "sync_cost": rep - 1,  # one sync per mirror
                "replicas": rep,
            }
        )
