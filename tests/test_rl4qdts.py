"""Tests for the RL4QDTS algorithm (Algorithms 1–3 + ablations)."""
import numpy as np
import pandas as pd
import pytest

from repro.core.dqn import DQN
from repro.core.mdp import CUBE_ACTIONS, CUBE_STATE_DIM, QDTSRuntime, point_state_dim
from repro.core.rl4qdts import (
    RL4QDTSConfig,
    choose_point,
    rl4qdts_simplify,
    traverse_cube,
)
from repro.workloads.distributions import query_centers

CFG = RL4QDTSConfig(start_level=3, max_depth=5, n_queries=30, n_query_centers=300,
                    query_spatial=1000.0, query_duration=6 * 3600.0, seed=0)


def _policies(seed=0):
    return DQN(CUBE_STATE_DIM, CUBE_ACTIONS, seed=seed), DQN(point_state_dim(2), 2, seed=seed + 1)


class TestSimplify:
    @pytest.mark.parametrize("ratio", [0.02, 0.05, 0.1])
    def test_budget_met(self, tiny_db, ratio):
        d = rl4qdts_simplify(tiny_db, ratio, config=CFG,
                             use_agent_cube=False, use_agent_point=False)
        n = len(tiny_db)
        m = tiny_db["traj_id"].nunique()
        expected = max(2 * m, int(round(ratio * n)))
        assert len(d) == expected

    def test_endpoints_always_kept(self, tiny_db):
        d = rl4qdts_simplify(tiny_db, 0.03, config=CFG,
                             use_agent_cube=False, use_agent_point=False)
        orig = tiny_db.groupby("traj_id")["seq"].agg(["min", "max"])
        got = d.groupby("traj_id")["seq"].agg(["min", "max"])
        pd.testing.assert_frame_equal(got, orig)

    def test_output_subset_of_input(self, tiny_db):
        d = rl4qdts_simplify(tiny_db, 0.03, config=CFG,
                             use_agent_cube=False, use_agent_point=False)
        merged = d.merge(tiny_db, on=["traj_id", "seq", "x", "y", "t"])
        assert len(merged) == len(d)

    def test_deterministic_given_rng(self, tiny_db):
        a = rl4qdts_simplify(tiny_db, 0.03, config=CFG, rng=np.random.default_rng(1),
                             use_agent_cube=False, use_agent_point=False)
        b = rl4qdts_simplify(tiny_db, 0.03, config=CFG, rng=np.random.default_rng(1),
                             use_agent_cube=False, use_agent_point=False)
        pd.testing.assert_frame_equal(a, b)

    def test_ratio_one_returns_everything(self, tiny_db):
        d = rl4qdts_simplify(tiny_db, 1.0, config=CFG,
                             use_agent_cube=False, use_agent_point=False)
        assert len(d) == len(tiny_db)

    def test_with_policies_runs(self, tiny_db):
        cube, point = _policies()
        d = rl4qdts_simplify(tiny_db, 0.03, cube_policy=cube, point_policy=point, config=CFG)
        assert len(d) == max(2 * tiny_db["traj_id"].nunique(), int(round(0.03 * len(tiny_db))))

    @pytest.mark.parametrize(
        "kw",
        [dict(use_agent_cube=False), dict(use_agent_point=False),
         dict(use_agent_cube=False, use_agent_point=False)],
    )
    def test_ablations_run(self, tiny_db, kw):
        cube, point = _policies()
        d = rl4qdts_simplify(tiny_db, 0.03, cube_policy=cube, point_policy=point,
                             config=CFG, **kw)
        assert len(d) > 0


class TestTraversal:
    def test_no_policy_stops_immediately(self, tiny_db):
        centers = query_centers(tiny_db, n=200, seed=0)
        rt = QDTSRuntime(tiny_db, centers, max_depth=5, k=2)
        node = rt.octree.root
        assert traverse_cube(rt, node, None, max_depth=5) is node

    def test_traversal_never_exceeds_max_depth(self, tiny_db):
        centers = query_centers(tiny_db, n=200, seed=0)
        rt = QDTSRuntime(tiny_db, centers, max_depth=5, k=2)
        cube_pol, _ = _policies()
        cube_pol.eps = 1.0  # fully random traversal
        for seed in range(10):
            cube_pol.rng = np.random.default_rng(seed)
            out = traverse_cube(rt, rt.octree.root, cube_pol, max_depth=4, greedy=False)
            assert out.depth <= 4

    def test_record_collects_transitions(self, tiny_db):
        centers = query_centers(tiny_db, n=200, seed=0)
        rt = QDTSRuntime(tiny_db, centers, max_depth=5, k=2)
        cube_pol, _ = _policies()
        rec = []
        traverse_cube(rt, rt.octree.root, cube_pol, max_depth=5, record=rec)
        assert len(rec) >= 1
        s, a, m = rec[-1]
        assert s.shape == (CUBE_STATE_DIM,)
        assert 0 <= a < CUBE_ACTIONS

    def test_traversal_ends_in_cube_with_candidates(self, tiny_db):
        centers = query_centers(tiny_db, n=200, seed=0)
        rt = QDTSRuntime(tiny_db, centers, max_depth=5, k=2)
        cube_pol, _ = _policies()
        out = traverse_cube(rt, rt.octree.root, cube_pol, max_depth=5)
        assert out.remaining > 0


class TestChoosePoint:
    def test_no_policy_picks_max_vs(self, tiny_db):
        centers = query_centers(tiny_db, n=200, seed=0)
        rt = QDTSRuntime(tiny_db, centers, max_depth=5, k=2)
        row = choose_point(rt, rt.octree.root, None)
        s, m, cand = rt.point_state(rt.octree.root)
        assert row == int(cand[0])

    def test_policy_action_within_mask(self, tiny_db):
        centers = query_centers(tiny_db, n=200, seed=0)
        rt = QDTSRuntime(tiny_db, centers, max_depth=5, k=2)
        _, point_pol = _policies()
        rec = []
        row = choose_point(rt, rt.octree.root, point_pol, record=rec)
        assert row is not None
        _, a, m = rec[0]
        assert m[a]
