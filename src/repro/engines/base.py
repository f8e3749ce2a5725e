"""Shared synchronous superstep machinery for all engines.

Every engine (Gemini, PowerGraph, PowerLyra, SLFE) is a synchronous
vertex-centric loop with the same skeleton:

1. *gather* — the expensive edge-side step, run in Spark SQL: join the
   persisted edge DataFrame against the current vertex values, filter per
   the engine's computation model, and aggregate one message per
   destination (``groupBy(dst).agg(min/max/sum)``);
2. *apply* — Catalyst column expressions combining each vertex's old value
   with its aggregated message;
3. *bookkeeping* — the tiny per-vertex state (<= ~35k rows at bench scale)
   is collected to the driver, which truncates lineage between supersteps
   (the iterative-DataFrame analogue of checkpointing) and yields exact
   per-superstep counters (computations / updates / messages) for free.

Engines differ only in the gather scope, the activation rule, and the
per-update communication cost of their partitioning scheme — see each
subclass. Application semantics come from :class:`AppSpec`; the same spec
runs unmodified on every engine, which is what lets the tests assert
value-equality across engines.
"""
from __future__ import annotations

import time
from dataclasses import dataclass
from typing import Callable

import numpy as np
import pandas as pd
from pyspark.sql import Column, DataFrame
from pyspark.sql import functions as F
from pyspark.sql import types as T

from repro.graphs.graph import Graph
from repro.metrics import RunMetrics

# Gemini's direction heuristic: pull when the active out-edge fraction is
# above 1/20 of |E| (dense), push otherwise (sparse).
DENSE_FRACTION = 20

# Value-stability granularity. The paper detects early-converged vertices
# when "the precision supported by the underlying hardware cannot reveal
# the changes"; on their hardware that is float32 over hundreds of
# supersteps. The simulated hardware exposes 3 decimal digits (half-
# precision-class) so the same convergence structure appears within the
# ~20-superstep budgets the sweeps can afford. Tests monkeypatch this for
# exactness checks. Stability is evaluated on the value an application
# *serves to its successors* (AppSpec.stable_expr — e.g. PageRank's
# rank/out_deg, exactly the divided rank that Algorithm 5 line 17
# compares), since that is what determines whether downstream vertices can
# observe a change.
STABLE_DECIMALS = 3

#: gather-scope codes uploaded per vertex (engines that don't use a scope
#: upload SCOPE_OPEN everywhere)
SCOPE_CLOSED = 0  # skipped entirely (start late / finish early)
SCOPE_OPENING = 1  # SLFE min/max: ruler opens now -> full all-source gather
SCOPE_OPEN = 2  # normal computation

VALS_SCHEMA = T.StructType(
    [
        T.StructField("id", T.LongType(), False),
        T.StructField("val", T.DoubleType(), False),
        T.StructField("active", T.BooleanType(), False),
        T.StructField("out_deg", T.LongType(), False),
        T.StructField("scope", T.LongType(), False),
    ]
)


@dataclass(frozen=True)
class AppSpec:
    """A vertex program: everything an engine needs to run one application.

    ``msg``/``better``/``vop`` build Catalyst column expressions, so the
    whole computation model executes inside Spark SQL.
    """

    name: str
    kind: str  # 'minmax' (start-late family) or 'arith' (finish-early family)
    agg: str  # 'min' | 'max' | 'sum'
    #: (src_val, w, src_out_deg) -> message column evaluated per edge
    msg: Callable[[Column, Column, Column], Column]
    #: minmax only: (msg, val) -> "msg improves val" boolean column
    better: Callable[[Column, Column], Column] | None = None
    #: arith only: aggregated msg sum -> new value column (paper's vOp)
    vop: Callable[[Column], Column] | None = None
    #: (num_vertices, root) -> (initial values, initially-active mask)
    init: Callable[[int, int | None], tuple[np.ndarray, np.ndarray]] | None = None
    symmetric: bool = False  # run on the symmetrised graph (CC)
    fixed_iters: int | None = None  # arith apps: superstep budget
    needs_root: bool = False
    #: arith only: (val, out_deg) -> the value served to successors, on
    #: which stability/EC is judged (paper Alg. 5 compares divided rank)
    stable_expr: Callable[[Column, Column], Column] | None = None

    def agg_fn(self, col: Column) -> Column:
        return {"min": F.min, "max": F.max, "sum": F.sum}[self.agg](col)


@dataclass
class RunResult:
    """Final per-vertex values plus the run's counted metrics."""

    values: pd.DataFrame  # columns: id, val
    metrics: RunMetrics
    state: pd.DataFrame  # full final driver state (tests/diagnostics)

    def values_np(self) -> np.ndarray:
        return self.values.sort_values("id")["val"].to_numpy()


class Engine:
    """Base synchronous engine; subclasses pick a style and a partitioning.

    ``style`` is one of:

    * ``'gemini'`` — gather from *active sources* (push and dense pull are
      work-equivalent in a dataflow execution: computation happens per
      active out-edge either way); arithmetic apps gather from all sources
      every superstep (paper footnote 2 / SPARK-3427);
    * ``'gas'``    — gather *all in-edges of signalled vertices*; scatter
      signals out-neighbours of changed vertices (PowerGraph/PowerLyra);
    * ``'slfe'``   — RRG-scoped pull plus correctness push, implemented in
      :class:`repro.core.slfe.SlfeEngine`.
    """

    name: str = "base"
    style: str = "gemini"
    #: per-edge cost multiplier for the modeled runtime (see repro.metrics)
    comp_cost_factor: float = 1.0

    # -- partitioning hooks -------------------------------------------------
    def vertex_statics(self, graph: Graph) -> pd.DataFrame:
        """Per-vertex ``sync_cost`` and ``replicas`` columns; cached on the graph."""
        raise NotImplementedError

    def _statics(self, graph: Graph) -> pd.DataFrame:
        key = self.name
        if key not in graph.engine_cache:
            graph.engine_cache[key] = self.vertex_statics(graph)
        return graph.engine_cache[key]

    # -- run-context hooks (overridden by SLFE) -----------------------------
    def make_context(self, graph: Graph, app: AppSpec, root: int | None) -> dict:
        return {}

    def choose_mode(self, ctx: dict, it: int, active_out_edges: int, num_edges: int) -> str:
        if self.style == "gas" or ctx.get("arith"):
            return "pull"
        return "pull" if active_out_edges * DENSE_FRACTION >= num_edges else "push"

    # -- the superstep loop --------------------------------------------------
    def run(
        self,
        graph: Graph,
        app: AppSpec,
        *,
        root: int | None = None,
        max_iters: int = 200,
    ) -> RunResult:
        if app.symmetric:
            graph = graph.as_undirected()
        spark = graph.spark
        if app.needs_root and root is None:
            root = graph.root()
        n = graph.num_vertices
        e_total = graph.num_edges
        statics = self._statics(graph)
        out_deg = graph.statics["out_deg"].to_numpy()
        in_deg = graph.statics["in_deg"].to_numpy()
        sync_cost = statics["sync_cost"].to_numpy()
        replicas = statics["replicas"].to_numpy()
        # Driver edge arrays back the exact per-superstep counters (GAS
        # scatter, active-edge computation counts, Table 2 vertex-compute
        # events). Cached on the graph; already materialised by the
        # partitioning statics.
        edges_pdf = graph.edges_pdf()

        metrics = RunMetrics(
            engine=self.name,
            app=app.name,
            graph=graph.name,
            num_vertices=n,
            num_edges=e_total,
            comp_cost_factor=self.comp_cost_factor,
        )
        ctx = self.make_context(graph, app, root)
        ctx["arith"] = app.kind == "arith"
        metrics.preprocess_time = ctx.get("preprocess_time", 0.0)

        vals, active = app.init(n, root)
        vals = vals.astype(np.float64)
        active = active.astype(bool)
        if self.style == "gas" and app.kind == "minmax":
            # GAS treats the initialisation as iteration 0's apply: the
            # initially-set vertices scatter, signalling their out-neighbours.
            active = self._scatter(edges_pdf, active, n)
        stable_cnt = np.zeros(n, dtype=np.int64)
        fixed = app.fixed_iters
        old_sp = spark.conf.get("spark.sql.shuffle.partitions")
        spark.conf.set("spark.sql.shuffle.partitions", str(graph.shuffle_partitions))
        t_start = time.perf_counter()
        prev_mode = None
        try:
            for it in range(1, max_iters + 1):
                active_out_edges = int(out_deg[active].sum())
                mode = self.choose_mode(ctx, it, active_out_edges, e_total)
                if (
                    self.style == "slfe"
                    and mode == "push"
                    and prev_mode == "pull"
                ):
                    # Algorithm 3: reactivate everything on the pull->push
                    # transition so RR-deactivated updates are not lost.
                    active = np.ones(n, dtype=bool)
                scope = self.pull_scope(ctx, it, stable_cnt, n)
                st = pd.DataFrame(
                    {
                        "id": np.arange(n, dtype=np.int64),
                        "val": vals,
                        "active": active,
                        "out_deg": out_deg,
                        "scope": scope,
                    }
                )
                vals_sdf = spark.createDataFrame(st, schema=VALS_SCHEMA)
                msgs = self.gather(graph, vals_sdf, app, mode)
                new_pdf = _apply(vals_sdf, msgs, app, self.style, mode)
                new_pdf = new_pdf.sort_values("id", ignore_index=True)
                new_vals = new_pdf["val"].to_numpy()
                changed = new_pdf["changed"].to_numpy().astype(bool)

                # -- exact per-superstep counters (driver-side, no extra jobs)
                comps = self._comps(
                    mode, it, ctx, active, scope, out_deg, in_deg, e_total, edges_pdf
                )
                n_changed = int(changed.sum())
                metrics.comps.append(comps)
                metrics.updates.append(n_changed)
                metrics.vertex_computes.append(
                    self._vertex_computes(ctx, active, scope, replicas, edges_pdf, n)
                )
                metrics.msgs.append(int(sync_cost[changed].sum()))
                metrics.modes.append(mode)

                if ctx["arith"]:
                    computed = scope > SCOPE_CLOSED
                    stable_cnt = np.where(
                        computed, np.where(changed, 0, stable_cnt + 1), stable_cnt
                    )
                vals = new_vals
                active = self.next_active(changed, edges_pdf, n, app)
                prev_mode = mode
                if self._should_stop(ctx, it, n_changed, fixed):
                    break
        finally:
            spark.conf.set("spark.sql.shuffle.partitions", old_sp)
        metrics.wall_time = time.perf_counter() - t_start
        final = pd.DataFrame(
            {
                "id": np.arange(n, dtype=np.int64),
                "val": vals,
                "stable_cnt": stable_cnt,
            }
        )
        return RunResult(values=final[["id", "val"]], metrics=metrics, state=final)

    # -- style-specific pieces ----------------------------------------------
    def pull_scope(
        self, ctx: dict, it: int, stable_cnt: np.ndarray, n: int
    ) -> np.ndarray:
        """Per-destination gather scope codes (SCOPE_* above)."""
        return np.full(n, SCOPE_OPEN, dtype=np.int64)

    def gather(
        self, graph: Graph, vals_sdf: DataFrame, app: AppSpec, mode: str
    ) -> DataFrame:
        """DataFrame(dst, msg): the engine's edge-side computation model."""
        if self.style == "gas":
            scope = vals_sdf.where("active").select(F.col("id").alias("dst"))
            e2 = graph.edges.join(scope, "dst").join(_src_vals(vals_sdf), "src")
        elif self.style == "gemini" and app.kind == "arith":
            e2 = graph.edges.join(_src_vals(vals_sdf), "src")
        else:  # gemini minmax push/pull: computation per active out-edge
            e2 = graph.edges.join(_src_vals(vals_sdf, only_active=True), "src")
        m = app.msg(F.col("src_val"), F.col("w"), F.col("src_out_deg"))
        return e2.groupBy("dst").agg(app.agg_fn(m).alias("msg"))

    def next_active(
        self, changed: np.ndarray, edges_pdf: pd.DataFrame | None, n: int, app: AppSpec
    ) -> np.ndarray:
        if self.style == "gas":
            return self._scatter(edges_pdf, changed, n)
        return changed.copy()

    @staticmethod
    def _scatter(edges_pdf: pd.DataFrame, changed: np.ndarray, n: int) -> np.ndarray:
        """GAS scatter: signal the out-neighbours of changed vertices."""
        src = edges_pdf["src"].to_numpy()
        dst = edges_pdf["dst"].to_numpy()
        nxt = np.zeros(n, dtype=bool)
        nxt[dst[changed[src]]] = True
        return nxt

    def _comps(
        self,
        mode: str,
        it: int,
        ctx: dict,
        active: np.ndarray,
        scope: np.ndarray,
        out_deg: np.ndarray,
        in_deg: np.ndarray,
        e_total: int,
        edges_pdf: pd.DataFrame | None,
    ) -> int:
        if self.style == "gas":
            return int(in_deg[active].sum())
        if self.style == "slfe" and mode == "pull":
            if ctx.get("arith"):
                return int(in_deg[scope > SCOPE_CLOSED].sum())
            # start late: full gathers for rulers opening now + active-edge
            # work into already-open destinations (exact edge-level count).
            src = edges_pdf["src"].to_numpy()
            dst = edges_pdf["dst"].to_numpy()
            active_edges = int((active[src] & (scope[dst] == SCOPE_OPEN)).sum())
            return int(in_deg[scope == SCOPE_OPENING].sum()) + active_edges
        if ctx.get("arith"):
            return e_total  # Gemini arith: every in-edge, every superstep
        return int(out_deg[active].sum())  # active-source push / dense pull

    def _vertex_computes(
        self,
        ctx: dict,
        active: np.ndarray,
        scope: np.ndarray,
        replicas: np.ndarray,
        edges_pdf: pd.DataFrame,
        n: int,
    ) -> int:
        """Vertex computation events this superstep (Table 2 unit).

        A vertex "computes" when its aggregation is evaluated: on GAS
        engines once per replica of every signalled vertex (mirrors run
        partial gathers); on Gemini for every destination with an active
        in-neighbour (arith: every vertex, every superstep); on SLFE only
        where the ruler allows.
        """
        if self.style == "gas":
            return int(replicas[active].sum())
        if ctx.get("arith"):
            if self.style == "slfe":
                return int((scope > SCOPE_CLOSED).sum())
            return n
        has_active_in = self._scatter(edges_pdf, active, n)
        if self.style == "slfe":
            return int(
                (scope == SCOPE_OPENING).sum()
                + (has_active_in & (scope == SCOPE_OPEN)).sum()
            )
        return int(has_active_in.sum())

    def _should_stop(self, ctx: dict, it: int, n_changed: int, fixed: int | None) -> bool:
        if fixed is not None and it >= fixed:
            return True
        return n_changed == 0


def _src_vals(vals_sdf: DataFrame, *, only_active: bool = False) -> DataFrame:
    v = vals_sdf.where("active") if only_active else vals_sdf
    return v.select(
        F.col("id").alias("src"),
        F.col("val").alias("src_val"),
        F.col("out_deg").alias("src_out_deg"),
    )


def _apply(
    vals_sdf: DataFrame, msgs: DataFrame, app: AppSpec, style: str, mode: str
) -> pd.DataFrame:
    """Catalyst apply phase: combine old values with aggregated messages."""
    j = vals_sdf.join(msgs, vals_sdf["id"] == msgs["dst"], "left").drop("dst")
    val, msg = F.col("val"), F.col("msg")
    if app.kind == "minmax":
        cond = msg.isNotNull() & app.better(msg, val)
        new_val = F.when(cond, msg).otherwise(val)
        changed = F.coalesce(cond, F.lit(False))
    else:
        if style == "gas":
            computed = F.col("active")
        elif style == "slfe":
            computed = F.col("scope") > F.lit(SCOPE_CLOSED)
        else:
            computed = F.lit(True)
        applied = app.vop(F.coalesce(msg, F.lit(0.0)))
        new_val = F.when(computed, applied).otherwise(val)
        if app.stable_expr is not None:
            obs_new = app.stable_expr(new_val, F.col("out_deg"))
            obs_old = app.stable_expr(val, F.col("out_deg"))
        else:
            obs_new, obs_old = new_val, val
        changed = computed & (
            F.round(obs_new, STABLE_DECIMALS) != F.round(obs_old, STABLE_DECIMALS)
        )
    return j.select(
        "id", new_val.alias("val"), changed.alias("changed")
    ).toPandas()
