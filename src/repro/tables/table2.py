"""Paper Table 2 — "Updates per vertex of SSSP in PowerLyra and Gemini".

Runs SSSP to convergence on each catalog graph under the two baselines and
reports per-vertex computation/update events (the paper notes this is
ideally 1 with no redundant computation). PowerLyra pays once per replica
of every signalled vertex (vertex-cut mirrors run partial gathers), which
is why its row sits above Gemini's, exactly as in the paper.

Paper numbers for diffing (8-node cluster, real graphs):

    =========  ====  ====  ====  ====  ====  ====  ====
    system       OK    LJ    WK    DI    PK    ST    FS
    PowerLyra  12.4  8.75  10.3  6.75  9.25  7.57     -
    Gemini     9.91  7.66  7.28  5.6   9.42  4.51  8.18
    =========  ====  ====  ====  ====  ====  ====  ====
"""
from __future__ import annotations

from pyspark.sql import SparkSession

from repro.apps import SSSP
from repro.engines import GeminiEngine, PowerLyraEngine
from repro.graphs.graph import catalog_graph

#: the paper's column order for Table 2
TABLE2_GRAPHS = ["OK", "LJ", "WK", "DI", "PK", "ST", "FS"]

PAPER_TABLE2 = {
    "powerlyra": {"OK": 12.4, "LJ": 8.75, "WK": 10.3, "DI": 6.75, "PK": 9.25, "ST": 7.57, "FS": None},
    "gemini": {"OK": 9.91, "LJ": 7.66, "WK": 7.28, "DI": 5.6, "PK": 9.42, "ST": 4.51, "FS": 8.18},
}


def run_table2(
    spark: SparkSession, *, scale: float = 2e-4, graphs: list[str] | None = None
) -> dict[str, dict[str, float]]:
    """Measure updates-per-vertex of SSSP for the Table 2 rows.

    Returns ``{engine: {graph: updates_per_vertex}}``.
    """
    graphs = graphs or TABLE2_GRAPHS
    engines = [PowerLyraEngine(), GeminiEngine()]
    out: dict[str, dict[str, float]] = {e.name: {} for e in engines}
    for gname in graphs:
        g = catalog_graph(spark, gname, scale=scale)
        for eng in engines:
            res = eng.run(g, SSSP)
            out[eng.name][gname] = res.metrics.updates_per_vertex()
        g.unpersist()
    return out


def format_table2(measured: dict[str, dict[str, float]]) -> str:
    """Render measured-vs-paper rows in the paper's layout."""
    graphs = [g for g in TABLE2_GRAPHS if g in next(iter(measured.values()))]
    lines = ["Table 2: updates per vertex of SSSP (measured | paper)"]
    header = f"{'system':12s}" + "".join(f"{g:>16s}" for g in graphs)
    lines.append(header)
    for eng, label in (("powerlyra", "PowerLyra"), ("gemini", "Gemini")):
        cells = []
        for g in graphs:
            paper = PAPER_TABLE2[eng].get(g)
            ptxt = f"{paper:.2f}" if paper is not None else "-"
            cells.append(f"{measured[eng][g]:8.2f} |{ptxt:>6s}")
        lines.append(f"{label:12s}" + "".join(f"{c:>16s}" for c in cells))
    return "\n".join(lines)
