"""Tests for the NumPy reference implementations, anchored on the paper's
Figure 1 worked example (its per-iteration table is reproduced verbatim)."""
from __future__ import annotations

import numpy as np
import pytest

from repro import reference as ref

INF = float("inf")

# The Figure 1 graph (see repro.graphs.graph.fig1_graph).
SRC = np.array([0, 0, 1, 3, 2, 4])
DST = np.array([1, 3, 2, 4, 4, 5])
W = np.array([1.0, 2.0, 1.0, 2.0, 1.0, 1.0])
N = 6


class TestFig1Sssp:
    def test_final_distances(self):
        d = ref.sssp(SRC, DST, W, N, 0)
        assert list(d) == [0, 1, 2, 2, 3, 4]

    def test_iteration_table_matches_paper(self):
        """The paper's Figure 1(b): V4 = inf,4,3,3 and V5 = inf,inf,5,4."""
        traj = ref.sssp_trajectory(SRC, DST, W, N, 0)
        v4 = [t[4] for t in traj]
        v5 = [t[5] for t in traj]
        assert v4 == [INF, 4.0, 3.0, 3.0]
        assert v5 == [INF, INF, 5.0, 4.0]

    def test_iteration_count(self):
        # Figure 1(b) shows 4 iterations to convergence.
        assert len(ref.sssp_trajectory(SRC, DST, W, N, 0)) == 4

    def test_v4_redundant_update(self):
        """V4 is updated twice (4 then 3) — the redundancy SLFE removes."""
        traj = ref.sssp_trajectory(SRC, DST, W, N, 0)
        v4 = [t[4] for t in traj]
        changes = sum(1 for a, b in zip([INF] + v4, v4) if a != b)
        assert changes == 2

    def test_unreachable_is_inf(self):
        d = ref.sssp(SRC, DST, W, N, 5)  # vertex 5 has no out-edges
        assert d[5] == 0 and np.isinf(d[:5]).all()


class TestFig1Others:
    def test_widest_path(self):
        wp = ref.widest_path(SRC, DST, W, N, 0)
        # root inf; V1 via w=1; V3 via w=2; V4 via min(2,2)=2; V5 via min(2,1)=1
        assert list(wp) == [INF, 1.0, 1.0, 2.0, 2.0, 1.0]

    def test_connected_components_single(self):
        cc = ref.connected_components(SRC, DST, N)
        assert (cc == 0).all()

    def test_connected_components_two(self):
        cc = ref.connected_components(np.array([0, 3]), np.array([1, 4]), 5)
        assert list(cc) == [0, 0, 2, 3, 3]

    def test_bfs_levels(self):
        lv = ref.bfs_levels(SRC, DST, N, [0])
        assert list(lv) == [0, 1, 2, 1, 2, 3]

    def test_rrg_last_iter(self):
        li = ref.rrg_last_iter(SRC, DST, N, [0])
        # 1 + max in-neighbour level: V1<-V0:1, V2<-V1:2, V3<-V0:1,
        # V4<-max(V3@1,V2@2)+1=3, V5<-V4@2+1=3, V0 has no in-neighbour.
        assert list(li) == [0, 1, 2, 1, 3, 3]


class TestPagerank:
    def test_no_edges_all_base_rank(self):
        pr = ref.pagerank(np.array([], dtype=int), np.array([], dtype=int), 4)
        assert np.allclose(pr, 0.15)

    def test_two_cycle_symmetry(self):
        pr = ref.pagerank(np.array([0, 1]), np.array([1, 0]), 2, iters=50)
        assert pr[0] == pytest.approx(pr[1])
        assert pr[0] == pytest.approx(1.0, abs=1e-6)

    def test_sink_receives_more(self):
        # 0->2, 1->2: vertex 2 collects two full contributions
        pr = ref.pagerank(np.array([0, 1]), np.array([2, 2]), 3)
        assert pr[2] > pr[0] == pr[1]

    def test_matches_explicit_two_steps(self):
        src, dst = np.array([0, 0, 1]), np.array([1, 2, 2])
        pr1 = ref.pagerank(src, dst, 3, iters=1)
        # out_deg: v0=2, v1=1; all ranks start at 1
        assert pr1[0] == pytest.approx(0.15)
        assert pr1[1] == pytest.approx(0.15 + 0.85 * 0.5)
        assert pr1[2] == pytest.approx(0.15 + 0.85 * 1.5)

    def test_deterministic(self):
        src, dst = SRC, DST
        assert np.array_equal(
            ref.pagerank(src, dst, N, iters=7), ref.pagerank(src, dst, N, iters=7)
        )


class TestTunkrank:
    def test_no_followers_zero(self):
        t = ref.tunkrank(np.array([0]), np.array([1]), 3, iters=5)
        assert t[0] == 0.0  # nobody follows vertex 0
        assert t[2] == 0.0

    def test_one_step(self):
        # 0 follows 1 (edge 0->1); T(1) = (1 + 0.5*T(0)) / 1
        t = ref.tunkrank(np.array([0]), np.array([1]), 2, iters=1)
        assert t[1] == pytest.approx((1 + 0.5 * 1.0) / 1)

    def test_split_attention(self):
        # 0 follows both 1 and 2: each gets half-weighted attention
        t = ref.tunkrank(np.array([0, 0]), np.array([1, 2]), 3, iters=3)
        assert t[1] == pytest.approx(t[2])


class TestProperties:
    """Cross-checks on a random graph (no engine code involved)."""

    @pytest.fixture(scope="class")
    def g(self):
        from repro.graphs.generators import make_edges

        pdf = make_edges("PK", scale=5e-5)
        n = int(max(pdf["src"].max(), pdf["dst"].max())) + 1
        return pdf["src"].to_numpy(), pdf["dst"].to_numpy(), pdf["w"].to_numpy(), n

    def test_sssp_triangle_inequality(self, g):
        src, dst, w, n = g
        d = ref.sssp(src, dst, w, n, 0)
        # every edge must satisfy d[dst] <= d[src] + w
        ok = d[dst] <= d[src] + w + 1e-9
        assert ok.all()

    def test_sssp_root_zero(self, g):
        src, dst, w, n = g
        assert ref.sssp(src, dst, w, n, 3)[3] == 0.0

    def test_cc_is_fixpoint(self, g):
        src, dst, w, n = g
        cc = ref.connected_components(src, dst, n)
        assert (cc[src] == cc[dst]).all()
        # labels are component minima: every label maps to itself
        assert (cc[cc.astype(int)] == cc).all()

    def test_wp_bounded_by_max_weight(self, g):
        src, dst, w, n = g
        wp = ref.widest_path(src, dst, w, n, 0)
        finite = np.isfinite(wp) & (wp > 0)
        assert wp[finite].max() <= w.max()

    def test_rrg_zero_only_without_reachable_inneighbors(self, g):
        src, dst, w, n = g
        lv = ref.bfs_levels(src, dst, n, [0])
        li = ref.rrg_last_iter(src, dst, n, [0])
        reached_dsts = np.unique(dst[lv[src] >= 0])
        assert (li[reached_dsts] >= 1).all()
