"""Genuine-SQL oracles: DuckDB recursive CTEs recompute SSSP from the raw
edge list and must agree with the engines. This is independent of the
NumPy reference, so a systematic bias shared by engine and reference would
still be caught here. Restricted to DAGs / the Figure 1 graph, where path
enumeration terminates."""
from __future__ import annotations

import numpy as np
import pandas as pd
import pytest

from repro.oracle import assert_equivalent

SSSP_CTE = """
WITH RECURSIVE paths(v, d) AS (
    SELECT {root}::BIGINT, 0.0::DOUBLE
    UNION ALL
    SELECT e.dst, p.d + e.w
    FROM paths p JOIN edges e ON e.src = p.v
    WHERE p.d + e.w <= {bound}
)
SELECT vs.id AS id,
       coalesce(min(p.d), CAST('inf' AS DOUBLE)) AS val
FROM vertices vs LEFT JOIN paths p ON p.v = vs.id
GROUP BY vs.id
"""


def _vertices(n: int) -> pd.DataFrame:
    return pd.DataFrame({"id": np.arange(n, dtype=np.int64)})


@pytest.mark.parametrize("engine", ["gemini", "powergraph", "powerlyra", "slfe"])
class TestRecursiveCteSssp:
    def test_fig1(self, spark, fig1, get_run, engine):
        res = get_run(fig1, engine, "SSSP", root=0)
        # root distance: the CTE seeds (root, 0), and min() keeps it 0
        sql = SSSP_CTE.format(root=0, bound=1000)
        assert_equivalent(
            spark.createDataFrame(res.values),
            sql,
            edges=fig1.edges_pdf(),
            vertices=_vertices(fig1.num_vertices),
        )

    def test_dag(self, spark, dag_graph, get_run, engine):
        res = get_run(dag_graph, engine, "SSSP", root=0)
        sql = SSSP_CTE.format(root=0, bound=10000)
        assert_equivalent(
            spark.createDataFrame(res.values),
            sql,
            edges=dag_graph.edges_pdf(),
            vertices=_vertices(dag_graph.num_vertices),
        )


def test_cte_oracle_detects_wrong_result(spark, fig1):
    """Negative control: a corrupted result must fail the oracle."""
    import repro.reference as ref

    pdf = fig1.edges_pdf()
    vals = ref.sssp(
        pdf["src"].to_numpy(), pdf["dst"].to_numpy(), pdf["w"].to_numpy(), 6, 0
    )
    bad = pd.DataFrame({"id": np.arange(6, dtype=np.int64), "val": vals})
    bad.loc[4, "val"] = 99.0
    with pytest.raises(AssertionError):
        assert_equivalent(
            spark.createDataFrame(bad),
            SSSP_CTE.format(root=0, bound=1000),
            edges=pdf,
            vertices=_vertices(6),
        )
