"""Shared fixtures: small graphs and a memoised engine-run cache.

Engine runs are the expensive unit here (each superstep is a Spark query),
so the matrix tests share one cache of RunResults keyed by
(engine, app, graph) — correctness, equivalence, and metrics tests all
read the same ~40 runs instead of re-running them.
"""
from __future__ import annotations

import numpy as np
import pytest

from repro.apps import APPS
from repro.core.slfe import SlfeEngine
from repro.engines import GeminiEngine, PowerGraphEngine, PowerLyraEngine
from repro.graphs.graph import Graph, build_graph, catalog_graph, fig1_graph

ENGINES = {
    "gemini": GeminiEngine,
    "powergraph": PowerGraphEngine,
    "powerlyra": PowerLyraEngine,
    "slfe": SlfeEngine,
}

#: the small catalog graph used by matrix tests (PK at 5e-5: ~80 vertices)
SMALL_SCALE = 5e-5


@pytest.fixture(scope="session")
def fig1(spark) -> Graph:
    g = fig1_graph(spark)
    yield g
    g.unpersist()


@pytest.fixture(scope="session")
def pk_small(spark) -> Graph:
    g = catalog_graph(spark, "PK", scale=SMALL_SCALE)
    yield g
    g.unpersist()


@pytest.fixture(scope="session")
def lj_small(spark) -> Graph:
    g = catalog_graph(spark, "LJ", scale=SMALL_SCALE)
    yield g
    g.unpersist()


@pytest.fixture(scope="session")
def dag_graph(spark) -> Graph:
    """A small random DAG (src < dst) — safe for recursive-CTE oracles.

    Kept tiny (18 vertices) so DuckDB's path enumeration stays bounded.
    """
    import pandas as pd

    rng = np.random.default_rng(42)
    n, m = 18, 40
    src = rng.integers(0, n - 1, m * 2)
    dst = rng.integers(1, n, m * 2)
    keep = src < dst
    pdf = (
        pd.DataFrame({"src": src[keep], "dst": dst[keep]})
        .drop_duplicates()
        .head(m)
        .reset_index(drop=True)
    )
    pdf["src"] = pdf["src"].astype("int64")
    pdf["dst"] = pdf["dst"].astype("int64")
    pdf["w"] = 1.0 + (pdf["src"].to_numpy() * 7 + pdf["dst"].to_numpy() * 3) % 5
    g = build_graph(spark, pdf, name="dag", num_vertices=n)
    yield g
    g.unpersist()


@pytest.fixture(scope="session")
def run_cache():
    """Memoised engine runs shared across test modules."""
    cache: dict = {}
    return cache


@pytest.fixture(scope="session")
def get_run(run_cache):
    def _get(graph: Graph, engine_name: str, app_name: str, root=None):
        key = (graph.name, engine_name, app_name, root)
        if key not in run_cache:
            eng = ENGINES[engine_name]()
            run_cache[key] = eng.run(graph, APPS[app_name], root=root)
        return run_cache[key]

    return _get


def reference_values(graph: Graph, app_name: str, root=None) -> np.ndarray:
    """NumPy oracle value for (graph, app) with engine-matching semantics."""
    from repro import reference as ref
    from repro.apps import APPS

    app = APPS[app_name]
    g = graph.as_undirected() if app.symmetric else graph
    pdf = g.edges_pdf()
    src = pdf["src"].to_numpy()
    dst = pdf["dst"].to_numpy()
    w = pdf["w"].to_numpy()
    n = g.num_vertices
    if root is None and app.needs_root:
        root = g.root()
    if app_name == "SSSP":
        return ref.sssp(src, dst, w, n, root)
    if app_name == "WP":
        return ref.widest_path(src, dst, w, n, root)
    if app_name == "CC":
        return ref.connected_components(src, dst, n)
    if app_name == "PR":
        return ref.pagerank(src, dst, n, iters=app.fixed_iters)
    if app_name == "TR":
        return ref.tunkrank(src, dst, n, iters=app.fixed_iters)
    raise KeyError(app_name)
