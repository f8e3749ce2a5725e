"""TunkRank: Twitter-style influence (paper Table 1, arith family).

An edge u->v means u follows v; u spreads attention evenly over everyone
it follows, so ``T(v) = sum over followers u of (1 + p * T(u)) / following(u)``
with retweet probability ``p = 0.5``. Same gather/apply shape as PageRank
(sum aggregation + vertexUpdate), so SLFE applies the multi-ruler to it
unchanged.
"""
from __future__ import annotations

import numpy as np
from pyspark.sql import Column
from pyspark.sql import functions as F

from repro.engines.base import AppSpec

P = 0.5
ITERS = 20


def _init(num_vertices: int, root: int | None) -> tuple[np.ndarray, np.ndarray]:
    return np.ones(num_vertices), np.ones(num_vertices, dtype=bool)


def _msg(src_val: Column, w: Column, src_out_deg: Column) -> Column:
    return (1.0 + P * src_val) / src_out_deg


def _vop(msg_sum: Column) -> Column:
    return msg_sum


def _stable(val: Column, out_deg: Column) -> Column:
    # Stability is judged on the attention each follower forwards — the
    # served (divided) quantity, as for PageRank.
    return (F.lit(1.0) + F.lit(P) * val) / F.greatest(out_deg, F.lit(1))


TR = AppSpec(
    name="TR",
    kind="arith",
    agg="sum",
    msg=_msg,
    vop=_vop,
    init=_init,
    fixed_iters=ITERS,
    stable_expr=_stable,
)
