"""Connected Components: min-label propagation over the symmetrised graph.

Every vertex starts with its own id as label and adopts the smallest label
seen among its neighbours; convergence labels each component by its
minimum vertex id.
"""
from __future__ import annotations

import numpy as np
from pyspark.sql import Column

from repro.engines.base import AppSpec


def _init(num_vertices: int, root: int | None) -> tuple[np.ndarray, np.ndarray]:
    return (
        np.arange(num_vertices, dtype=np.float64),
        np.ones(num_vertices, dtype=bool),
    )


def _msg(src_val: Column, w: Column, src_out_deg: Column) -> Column:
    return src_val


def _better(msg: Column, val: Column) -> Column:
    return msg < val


CC = AppSpec(
    name="CC",
    kind="minmax",
    agg="min",
    msg=_msg,
    better=_better,
    init=_init,
    symmetric=True,
)
