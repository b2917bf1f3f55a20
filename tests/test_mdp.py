"""Tests for the QDTSRuntime (MDP state construction, Eqs. 4–9)."""
import numpy as np
import pytest

from repro.core.mdp import CUBE_ACTIONS, CUBE_STATE_DIM, QDTSRuntime, point_state_dim
from repro.workloads.distributions import query_centers


@pytest.fixture()
def rt(tiny_db):
    centers = query_centers(tiny_db, n=300, distribution="data", seed=0)
    return QDTSRuntime(tiny_db, centers, max_depth=5, k=2)


class TestInitialState:
    def test_endpoints_selected(self, rt, tiny_db):
        sel = rt.db[rt.selected]
        per = sel.groupby("traj_id")["seq"].agg(["min", "max", "count"])
        orig = tiny_db.groupby("traj_id")["seq"].agg(["min", "max"])
        for tid in orig.index:
            assert per.loc[tid, "min"] == orig.loc[tid, "min"]
            assert per.loc[tid, "max"] == orig.loc[tid, "max"]
            assert per.loc[tid, "count"] == 2

    def test_n_selected_matches_mask(self, rt):
        assert rt.n_selected == int(rt.selected.sum())

    def test_anchor_arrays_bracket_rows(self, rt):
        unsel = np.nonzero(~rt.selected)[0]
        assert np.all(rt.anchor_lo[unsel] < unsel)
        assert np.all(rt.anchor_hi[unsel] > unsel)
        assert rt.selected[rt.anchor_lo[unsel]].all()
        assert rt.selected[rt.anchor_hi[unsel]].all()


class TestInsert:
    def test_insert_updates_anchors(self, rt):
        row = int(np.nonzero(~rt.selected)[0][5])
        a, b = int(rt.anchor_lo[row]), int(rt.anchor_hi[row])
        rt.insert(row)
        assert rt.selected[row]
        for r in range(a + 1, row):
            assert rt.anchor_hi[r] == row
        for r in range(row + 1, b):
            assert rt.anchor_lo[r] == row

    def test_double_insert_raises(self, rt):
        row = int(np.nonzero(~rt.selected)[0][0])
        rt.insert(row)
        with pytest.raises(ValueError):
            rt.insert(row)

    def test_octree_remaining_tracks_inserts(self, rt):
        before = rt.octree.root.remaining
        row = int(np.nonzero(~rt.selected)[0][10])
        rt.insert(row)
        assert rt.octree.root.remaining == before - 1

    def test_simplified_db_contains_inserted(self, rt):
        row = int(np.nonzero(~rt.selected)[0][3])
        tid, seq = int(rt.traj[row]), int(rt.seq[row])
        rt.insert(row)
        d = rt.simplified_db()
        assert ((d["traj_id"] == tid) & (d["seq"] == seq)).any()


class TestCubeState:
    def test_shape_and_mask(self, rt):
        s, m = rt.cube_state(rt.octree.root)
        assert s.shape == (CUBE_STATE_DIM,)
        assert m.shape == (CUBE_ACTIONS,)
        assert m[8]  # root has unselected points

    def test_m_ratios_sum_to_at_least_one(self, rt):
        # children partition the parent's trajectories (with overlap:
        # one trajectory can span several children), so ratios sum ≥ 1.
        s, _ = rt.cube_state(rt.octree.root)
        assert s[0::2].sum() >= 1.0 - 1e-9

    def test_ratios_bounded(self, rt):
        s, _ = rt.cube_state(rt.octree.root)
        assert np.all(s >= 0) and np.all(s <= 1.0 + 1e-9)

    def test_leaf_masks_only_stop(self, rt):
        node = rt.octree.root
        while node.children is not None:
            node = next(c for c in node.children if c is not None)
        s, m = rt.cube_state(node)
        assert not m[:8].any()

    def test_exhausted_child_masked(self, tiny_db):
        centers = query_centers(tiny_db, n=50, seed=1)
        rt = QDTSRuntime(tiny_db, centers, max_depth=3, k=2)
        node = rt.octree.root
        child = next(c for c in node.children if c is not None)
        for row in child.idx:
            if not rt.selected[row]:
                rt.insert(int(row))
        _, m = rt.cube_state(node)
        j = node.children.index(child)
        assert not m[j]


class TestPointState:
    def test_shape_and_mask(self, rt):
        s, m, cand = rt.point_state(rt.octree.root)
        assert s.shape == (point_state_dim(2),)
        assert m.shape == (2,)
        assert len(cand) <= 2
        assert m[: len(cand)].all()

    def test_candidates_unselected(self, rt):
        _, _, cand = rt.point_state(rt.octree.root)
        assert not rt.selected[cand].any()

    def test_one_candidate_per_trajectory(self, rt):
        _, _, cand = rt.point_state(rt.octree.root)
        tids = rt.traj[cand]
        assert len(np.unique(tids)) == len(cand)

    def test_vs_sorted_descending(self, rt):
        s, m, cand = rt.point_state(rt.octree.root)
        if m.sum() == 2:
            assert s[0] >= s[2]
            assert s[0] == pytest.approx(1.0)  # normalized max

    def test_state_normalized(self, rt):
        s, _, _ = rt.point_state(rt.octree.root)
        assert np.all(s <= 1.0 + 1e-9) and np.all(s >= 0)

    def test_empty_cube_returns_no_candidates(self, rt):
        # exhaust a leaf then ask for its state
        node = rt.octree.root
        while node.children is not None:
            node = next(c for c in node.children if c is not None)
        for row in node.idx:
            if not rt.selected[row]:
                rt.insert(int(row))
        s, m, cand = rt.point_state(node)
        assert len(cand) == 0 and not m.any()

    def test_values_match_manual_sed(self, rt):
        # hand-verify v_s of a specific candidate row
        row = int(np.nonzero(~rt.selected)[0][0])
        a, b = int(rt.anchor_lo[row]), int(rt.anchor_hi[row])
        vs, vt = rt._values_for_rows(np.array([row]))
        dt = rt.t[b] - rt.t[a]
        u = (rt.t[row] - rt.t[a]) / dt
        sx = rt.x[a] + u * (rt.x[b] - rt.x[a])
        sy = rt.y[a] + u * (rt.y[b] - rt.y[a])
        assert vs[0] == pytest.approx(np.hypot(rt.x[row] - sx, rt.y[row] - sy))
        assert vt[0] >= 0


class TestStartNodes:
    def test_weights_are_distribution(self, rt):
        for by in ("query", "data"):
            nodes, w = rt.start_nodes(2, by=by)
            assert len(nodes) == len(w)
            assert w.sum() == pytest.approx(1.0)
            assert np.all(w > 0)

    def test_nodes_have_candidates(self, rt):
        nodes, _ = rt.start_nodes(3)
        assert all(nd.remaining > 0 for nd in nodes)

    def test_unknown_sampling_raises(self, rt):
        with pytest.raises(ValueError):
            rt.start_nodes(2, by="nope")

    def test_data_weights_proportional_to_remaining(self, rt):
        nodes, w = rt.start_nodes(2, by="data")
        rem = np.array([nd.remaining for nd in nodes], dtype=float)
        assert np.allclose(w, rem / rem.sum())
