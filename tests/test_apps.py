"""AppSpec sanity: the five applications match the paper's Table 1
classification, and their Catalyst expressions evaluate correctly."""
from __future__ import annotations

import numpy as np
import pytest
from pyspark.sql import functions as F

from repro.apps import APPS, CC, PR, SSSP, TR, WP


class TestTable1Classification:
    def test_five_apps(self):
        assert list(APPS) == ["SSSP", "CC", "WP", "PR", "TR"]

    @pytest.mark.parametrize("app", [SSSP, CC, WP])
    def test_minmax_family(self, app):
        assert app.kind == "minmax"
        assert app.agg in ("min", "max")
        assert app.better is not None and app.vop is None

    @pytest.mark.parametrize("app", [PR, TR])
    def test_arith_family(self, app):
        assert app.kind == "arith"
        assert app.agg == "sum"
        assert app.vop is not None and app.better is None
        assert app.fixed_iters and app.fixed_iters >= 10
        assert app.stable_expr is not None

    def test_only_cc_symmetric(self):
        assert CC.symmetric
        assert not any(a.symmetric for a in (SSSP, WP, PR, TR))

    def test_rooted_apps(self):
        assert SSSP.needs_root and WP.needs_root
        assert not CC.needs_root and not PR.needs_root


class TestInit:
    def test_sssp_init(self):
        vals, act = SSSP.init(5, 2)
        assert vals[2] == 0 and np.isinf(vals[[0, 1, 3, 4]]).all()
        assert act[2] and act.sum() == 1

    def test_wp_init(self):
        vals, act = WP.init(4, 1)
        assert np.isinf(vals[1]) and (vals[[0, 2, 3]] == 0).all()
        assert act[1] and act.sum() == 1

    def test_cc_init(self):
        vals, act = CC.init(4, None)
        assert list(vals) == [0, 1, 2, 3]
        assert act.all()

    @pytest.mark.parametrize("app", [PR, TR])
    def test_arith_init(self, app):
        vals, act = app.init(3, None)
        assert (vals == 1.0).all() and act.all()


class TestExpressions:
    """Evaluate the Catalyst msg/vop expressions on a one-row frame."""

    @pytest.fixture(scope="class")
    def row(self, spark):
        return spark.createDataFrame(
            [(4.0, 3.0, 2)], "src_val double, w double, src_out_deg long"
        )

    def _eval(self, row, col):
        return row.select(col.alias("x")).first()["x"]

    def test_sssp_msg(self, row):
        assert self._eval(row, SSSP.msg(F.col("src_val"), F.col("w"), F.col("src_out_deg"))) == 7.0

    def test_wp_msg_is_min(self, row):
        assert self._eval(row, WP.msg(F.col("src_val"), F.col("w"), F.col("src_out_deg"))) == 3.0

    def test_cc_msg_is_label(self, row):
        assert self._eval(row, CC.msg(F.col("src_val"), F.col("w"), F.col("src_out_deg"))) == 4.0

    def test_pr_msg_divides(self, row):
        assert self._eval(row, PR.msg(F.col("src_val"), F.col("w"), F.col("src_out_deg"))) == 2.0

    def test_tr_msg(self, row):
        # (1 + 0.5*4)/2 = 1.5
        assert self._eval(row, TR.msg(F.col("src_val"), F.col("w"), F.col("src_out_deg"))) == 1.5

    def test_pr_vop(self, row):
        assert self._eval(row, PR.vop(F.lit(1.0))) == pytest.approx(1.0)
        assert self._eval(row, PR.vop(F.lit(0.0))) == pytest.approx(0.15)

    def test_tr_vop_identity(self, row):
        assert self._eval(row, TR.vop(F.lit(2.5))) == 2.5

    def test_pr_stable_expr_divides(self, row):
        assert self._eval(row, PR.stable_expr(F.lit(3.0), F.col("src_out_deg"))) == 1.5

    def test_better_predicates(self, row):
        assert self._eval(row, SSSP.better(F.lit(1.0), F.lit(2.0)))
        assert not self._eval(row, SSSP.better(F.lit(2.0), F.lit(1.0)))
        assert self._eval(row, WP.better(F.lit(2.0), F.lit(1.0)))
        assert not self._eval(row, WP.better(F.lit(1.0), F.lit(2.0)))

    def test_agg_fn_dispatch(self, spark):
        df = spark.createDataFrame([(1.0,), (3.0,)], "x double")
        assert df.agg(SSSP.agg_fn(F.col("x")).alias("a")).first()["a"] == 1.0
        assert df.agg(WP.agg_fn(F.col("x")).alias("a")).first()["a"] == 3.0
        assert df.agg(PR.agg_fn(F.col("x")).alias("a")).first()["a"] == 4.0
