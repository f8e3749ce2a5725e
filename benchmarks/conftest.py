"""Benchmark fixtures: a PK-scale catalog graph shared across benchmarks."""
from __future__ import annotations

import pytest

from repro.graphs.graph import catalog_graph

BENCH_SCALE = 2e-4  # the table jobs' default scale (~320-13k vertices)


@pytest.fixture(scope="session")
def pk_bench(spark):
    g = catalog_graph(spark, "PK", scale=BENCH_SCALE)
    yield g
    g.unpersist()
