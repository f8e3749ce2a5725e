"""Benchmark backing the paper's Table 2: SSSP updates-per-vertex on the
two baselines. Timing covers a full run to convergence; the Table 2
quantity itself is attached as extra_info so the bench report carries the
measured vs paper rows."""
from __future__ import annotations

import pytest

from repro.apps import SSSP
from repro.engines import GeminiEngine, PowerLyraEngine
from repro.tables.table2 import PAPER_TABLE2

ENGINES = {"gemini": GeminiEngine, "powerlyra": PowerLyraEngine}


@pytest.mark.parametrize("engine", ["gemini", "powerlyra"])
def test_table2_sssp_updates_per_vertex(benchmark, pk_bench, engine):
    eng = ENGINES[engine]()

    def run():
        return eng.run(pk_bench, SSSP)

    res = benchmark.pedantic(run, rounds=2, iterations=1)
    upd = res.metrics.updates_per_vertex()
    benchmark.extra_info["updates_per_vertex"] = round(upd, 2)
    benchmark.extra_info["paper_updates_per_vertex_PK"] = PAPER_TABLE2[engine]["PK"]
    assert upd > 1.0  # the redundancy Table 2 demonstrates
