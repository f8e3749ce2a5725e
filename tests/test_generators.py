"""Unit tests for the synthetic graph generators (Table 4 stand-ins)."""
from __future__ import annotations

import numpy as np
import pandas as pd
import pytest

from repro.graphs.generators import GRAPHS, edge_weights, make_edges, rmat_edges

CATALOG = list(GRAPHS)


class TestGraphSpec:
    @pytest.mark.parametrize("name", CATALOG)
    def test_sized_preserves_avg_degree(self, name):
        spec = GRAPHS[name]
        v, e = spec.sized(2e-4)
        paper_deg = spec.paper_edges / spec.paper_vertices
        assert e / v == pytest.approx(paper_deg, rel=0.05)

    @pytest.mark.parametrize("name", CATALOG)
    def test_sized_scales_linearly(self, name):
        spec = GRAPHS[name]
        v1, e1 = spec.sized(1e-4)
        v2, e2 = spec.sized(2e-4)
        assert v2 == pytest.approx(2 * v1, rel=0.02)
        assert e2 == pytest.approx(2 * e1, rel=0.05)

    def test_sized_floors(self):
        v, e = GRAPHS["PK"].sized(1e-9)
        assert v >= 16 and e >= v

    def test_catalog_matches_paper_table4(self):
        assert GRAPHS["PK"].paper_vertices == 1_600_000
        assert GRAPHS["FS"].paper_edges == 1_800_000_000
        assert GRAPHS["RMAT"].paper_vertices == 300_000_000
        assert len(GRAPHS) == 8


class TestRmat:
    def test_deterministic(self):
        a = rmat_edges(256, 2000, seed=5)
        b = rmat_edges(256, 2000, seed=5)
        pd.testing.assert_frame_equal(a, b)

    def test_seed_changes_output(self):
        a = rmat_edges(256, 2000, seed=5)
        b = rmat_edges(256, 2000, seed=6)
        assert not a.equals(b)

    def test_exact_edge_count(self):
        pdf = rmat_edges(512, 5000, seed=1)
        assert len(pdf) == 5000

    def test_no_self_loops(self):
        pdf = rmat_edges(256, 3000, seed=2)
        assert (pdf["src"] != pdf["dst"]).all()

    def test_no_duplicate_edges(self):
        pdf = rmat_edges(256, 3000, seed=3)
        assert not pdf.duplicated(["src", "dst"]).any()

    def test_ids_in_range(self):
        pdf = rmat_edges(300, 2500, seed=4)
        for c in ("src", "dst"):
            assert pdf[c].min() >= 0
            assert pdf[c].max() < 300

    def test_degree_skew(self):
        """RMAT must be heavier-tailed than an Erdos-Renyi graph."""
        pdf = rmat_edges(1024, 20000, seed=7)
        deg = np.bincount(pdf["src"].to_numpy(), minlength=1024)
        # top-1% of vertices should own far more than 1% of edges
        top = np.sort(deg)[-10:].sum()
        assert top / deg.sum() > 0.05

    def test_skew_profile_ordering(self):
        """The 'hyperlink' profile is more skewed than 'folksonomy'."""
        from repro.graphs.generators import _SKEW

        hyper = rmat_edges(1024, 20000, seed=8, abcd=_SKEW["hyperlink"])
        folks = rmat_edges(1024, 20000, seed=8, abcd=_SKEW["folksonomy"])

        def top_share(pdf):
            deg = np.bincount(pdf["src"].to_numpy(), minlength=1024)
            return np.sort(deg)[-10:].sum() / deg.sum()

        assert top_share(hyper) > top_share(folks)


class TestWeights:
    def test_deterministic_and_integer(self):
        src = np.arange(1000, dtype=np.int64)
        dst = (src * 7 + 3) % 999
        w = edge_weights(src, dst)
        assert np.array_equal(w, edge_weights(src, dst))
        assert np.array_equal(w, np.round(w))  # integers => exact float sums

    def test_range(self):
        src = np.arange(5000, dtype=np.int64)
        dst = (src * 31 + 17) % 4999
        w = edge_weights(src, dst)
        assert w.min() >= 1.0 and w.max() <= 64.0

    def test_spread(self):
        src = np.arange(5000, dtype=np.int64)
        dst = (src * 31 + 17) % 4999
        assert len(np.unique(edge_weights(src, dst))) > 32


class TestMakeEdges:
    @pytest.mark.parametrize("name", [n for n in CATALOG if n != "RMAT"])
    def test_catalog_graph_sizes(self, name):
        spec = GRAPHS[name]
        v, e = spec.sized(5e-5)
        pdf = make_edges(name, scale=5e-5)
        # exact when the distinct-pair pool allows; <=3% shortfall otherwise
        assert 0.97 * e <= len(pdf) <= e
        assert pdf["src"].max() < v and pdf["dst"].max() < v
        assert set(pdf.columns) == {"src", "dst", "w"}

    def test_deterministic(self):
        a = make_edges("PK", scale=5e-5)
        b = make_edges("PK", scale=5e-5)
        pd.testing.assert_frame_equal(a, b)

    def test_different_graphs_differ(self):
        a = make_edges("PK", scale=5e-5)
        b = make_edges("ST", scale=5e-5)
        assert not a.equals(b)
