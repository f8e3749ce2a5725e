"""Single Source Shortest Path — the paper's Algorithm 4.

Vertex property ``dist``; edge relaxation ``dist[src] + w``; ``min``
aggregation; a vertex improves (and activates) when it receives a smaller
distance. The same spec runs on every engine; SLFE schedules it with the
single Ruler (start late).
"""
from __future__ import annotations

import numpy as np
from pyspark.sql import Column

from repro.engines.base import AppSpec

INF = float("inf")


def _init(num_vertices: int, root: int | None) -> tuple[np.ndarray, np.ndarray]:
    vals = np.full(num_vertices, INF)
    active = np.zeros(num_vertices, dtype=bool)
    vals[root] = 0.0
    active[root] = True
    return vals, active


def _msg(src_val: Column, w: Column, src_out_deg: Column) -> Column:
    return src_val + w


def _better(msg: Column, val: Column) -> Column:
    return msg < val


SSSP = AppSpec(
    name="SSSP",
    kind="minmax",
    agg="min",
    msg=_msg,
    better=_better,
    init=_init,
    needs_root=True,
)
