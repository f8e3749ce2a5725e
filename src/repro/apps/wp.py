"""Widest Path: maximise the minimum edge weight along a path from the root.

``width(v) = max over in-edges (u,v) of min(width(u), w(u,v))``; the root
has infinite width, unreachable vertices keep width 0. A ``max``
aggregation with monotonically non-decreasing values — the second member
of the paper's min/max (start-late) family that is *max*-shaped.
"""
from __future__ import annotations

import numpy as np
from pyspark.sql import Column
from pyspark.sql import functions as F

from repro.engines.base import AppSpec

INF = float("inf")


def _init(num_vertices: int, root: int | None) -> tuple[np.ndarray, np.ndarray]:
    vals = np.zeros(num_vertices)
    active = np.zeros(num_vertices, dtype=bool)
    vals[root] = INF
    active[root] = True
    return vals, active


def _msg(src_val: Column, w: Column, src_out_deg: Column) -> Column:
    return F.least(src_val, w)


def _better(msg: Column, val: Column) -> Column:
    return msg > val


WP = AppSpec(
    name="WP",
    kind="minmax",
    agg="max",
    msg=_msg,
    better=_better,
    init=_init,
    needs_root=True,
)
