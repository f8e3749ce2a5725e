"""The provided synth_data generators still work, plus the graph wrappers."""
from __future__ import annotations

import pytest

from repro import synth_data
from repro.oracle import assert_equivalent


class TestTpchLite:
    def test_lineitem_oracle_roundtrip(self, spark):
        li = synth_data.lineitem(spark, sf=0.001)
        from pyspark.sql import functions as F

        got = li.groupBy("l_returnflag").agg(
            F.sum("l_quantity").alias("sum_qty"),
            F.count("*").alias("cnt"),
        )
        assert_equivalent(
            got,
            """SELECT l_returnflag, sum(l_quantity) AS sum_qty, count(*) AS cnt
               FROM li GROUP BY l_returnflag""",
            li=li,
        )

    def test_orders_deterministic(self, spark):
        a = synth_data.orders(spark, sf=0.001).toPandas()
        b = synth_data.orders(spark, sf=0.001).toPandas()
        assert a.equals(b)

    def test_zipf_is_skewed(self, spark):
        z = synth_data.zipf_keys(spark, n=5000, n_keys=100).toPandas()
        top = z["k"].value_counts().iloc[0]
        assert top > 5000 / 100 * 5  # far above the uniform share


class TestGraphWrappers:
    def test_graph_edges_schema(self, spark):
        df = synth_data.graph_edges(spark, "PK", scale=5e-5)
        assert set(df.columns) == {"src", "dst", "w"}
        assert df.count() > 0

    def test_rmat_explicit_size(self, spark):
        df = synth_data.rmat(spark, num_vertices=128, num_edges=1000, seed=3)
        assert df.count() == 1000

    def test_graph_edges_matches_generator(self, spark):
        from repro.graphs.generators import make_edges

        got = synth_data.graph_edges(spark, "ST", scale=5e-5).toPandas()
        exp = make_edges("ST", scale=5e-5)
        assert got.reset_index(drop=True).equals(exp.reset_index(drop=True))
