"""Unit tests for the (x, y, t) octree index."""
import numpy as np
import pytest

from repro.core.octree import Octree


def grid_points(n_side=8, seed=0):
    g = np.random.default_rng(seed)
    xyz = g.uniform(0, 100, (n_side**3, 3))
    tids = g.integers(0, 10, len(xyz))
    return xyz, tids


@pytest.fixture(scope="module")
def tree():
    xyz, tids = grid_points()
    return Octree(xyz, tids, max_depth=4, leaf_size=4)


class TestBuild:
    def test_root_holds_all_points(self, tree):
        assert len(tree.root.idx) == len(tree.xyz)

    def test_children_partition_parent(self, tree):
        def rec(node):
            if node.children is None:
                return
            child_idx = np.concatenate(
                [c.idx for c in node.children if c is not None]
            )
            assert sorted(child_idx.tolist()) == sorted(node.idx.tolist())
            for c in node.children:
                if c is not None:
                    rec(c)

        rec(tree.root)

    def test_points_inside_node_bounds(self, tree):
        def rec(node):
            pts = tree.xyz[node.idx]
            assert np.all(pts >= node.lo - 1e-9) and np.all(pts <= node.hi + 1e-9)
            if node.children:
                for c in node.children:
                    if c is not None:
                        rec(c)

        rec(tree.root)

    def test_max_depth_respected(self, tree):
        def rec(node):
            assert node.depth <= 4
            if node.children:
                assert node.depth < 4
                for c in node.children:
                    if c is not None:
                        rec(c)

        rec(tree.root)

    def test_leaf_size_stops_splitting(self):
        xyz, tids = grid_points(4)
        t = Octree(xyz, tids, max_depth=10, leaf_size=100)
        # root has 64 ≤ 100 points → no split at all
        assert t.root.is_leaf

    def test_m_counts_distinct_trajectories(self, tree):
        def rec(node):
            assert node.m == len(np.unique(tree.traj_ids[node.idx]))
            if node.children:
                for c in node.children:
                    if c is not None:
                        rec(c)

        rec(tree.root)

    def test_degenerate_dimension_handled(self):
        xyz = np.column_stack([np.arange(20.0), np.zeros(20), np.zeros(20)])
        t = Octree(xyz, np.zeros(20, dtype=np.int64), max_depth=3, leaf_size=2)
        assert len(t.root.idx) == 20


class TestQueries:
    def test_center_counts(self, tree):
        centers = tree.xyz[:10]  # centers at the first 10 points
        tree.assign_queries(centers)
        assert tree.root.q == 10

    def test_center_counts_sum_over_children(self, tree):
        centers = tree.xyz[::5]
        tree.assign_queries(centers)
        if tree.root.children:
            total = sum(c.q for c in tree.root.children if c is not None)
            assert total == tree.root.q

    def test_outside_center_not_counted(self, tree):
        tree.assign_queries(np.array([[1e6, 1e6, 1e6]]))
        assert tree.root.q == 0


class TestLevelsAndSelection:
    def test_nodes_at_level_cover_all_points(self, tree):
        for level in (1, 2, 3, 4):
            nodes = tree.nodes_at_level(level)
            covered = np.concatenate([n.idx for n in nodes])
            assert sorted(covered.tolist()) == list(range(len(tree.xyz)))

    def test_mark_selected_decrements_path(self):
        xyz, tids = grid_points()
        t = Octree(xyz, tids, max_depth=4, leaf_size=4)
        before = t.root.remaining
        t.mark_selected(0)
        assert t.root.remaining == before - 1
        # the leaf containing point 0 also decremented
        node = t.root
        while not node.is_leaf:
            node = next(
                c for c in node.children if c is not None and 0 in set(c.idx.tolist())
            )
        assert node.remaining == len(node.idx) - 1

    def test_candidates_respect_selected_mask(self, tree):
        selected = np.zeros(len(tree.xyz), dtype=bool)
        selected[tree.root.idx[:50]] = True
        cand = tree.candidates(tree.root, selected)
        assert len(cand) == len(tree.xyz) - 50
        assert not selected[cand].any()
