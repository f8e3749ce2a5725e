"""PageRank — the paper's Algorithm 5 recurrence.

Stored property is the *undivided* rank; each superstep a vertex gathers
``sum(rank[u] / out_deg[u])`` over in-neighbours and applies the paper's
``vOp``: ``rank = 0.15 + 0.85 * sum``. Dangling mass is dropped, exactly
as in the pseudo-code. On SLFE, the multi-ruler (stableCnt vs last_iter)
freezes early-converged vertices (finish early).
"""
from __future__ import annotations

import numpy as np
from pyspark.sql import Column
from pyspark.sql import functions as F

from repro.engines.base import AppSpec

DAMPING = 0.85
ITERS = 20


def _init(num_vertices: int, root: int | None) -> tuple[np.ndarray, np.ndarray]:
    return np.ones(num_vertices), np.ones(num_vertices, dtype=bool)


def _msg(src_val: Column, w: Column, src_out_deg: Column) -> Column:
    return src_val / src_out_deg


def _vop(msg_sum: Column) -> Column:
    return F.lit(1 - DAMPING) + F.lit(DAMPING) * msg_sum


def _stable(val: Column, out_deg: Column) -> Column:
    # Algorithm 5 line 17 compares the rank *after* dividing by the number
    # of outgoing edges — the value successors actually consume.
    return val / F.greatest(out_deg, F.lit(1))


PR = AppSpec(
    name="PR",
    kind="arith",
    agg="sum",
    msg=_msg,
    vop=_vop,
    init=_init,
    fixed_iters=ITERS,
    stable_expr=_stable,
)
