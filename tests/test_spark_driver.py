"""Tests for the Spark distribution of RL4QDTS (spark_driver)."""
import numpy as np
import pandas as pd
import pytest

from repro.core.dqn import DQN
from repro.core.mdp import CUBE_ACTIONS, CUBE_STATE_DIM, point_state_dim
from repro.core.rl4qdts import RL4QDTSConfig
from repro.core.spark_driver import simplify_database_rl_spark, train_policy_seeds_spark
from repro.synth_data import trajectory_db_pandas

CFG = RL4QDTSConfig(start_level=3, max_depth=5, n_queries=20, n_query_centers=200,
                    query_spatial=1000.0, query_duration=6 * 3600.0, seed=0)


@pytest.fixture(scope="module")
def policies_bytes():
    cube = DQN(CUBE_STATE_DIM, CUBE_ACTIONS, seed=0)
    point = DQN(point_state_dim(2), 2, seed=1)
    return cube.to_bytes(), point.to_bytes()


class TestDistributedSimplify:
    def test_schema_and_endpoints(self, spark, tiny_db, policies_bytes):
        df = spark.createDataFrame(tiny_db)
        out = simplify_database_rl_spark(
            df, 0.05, cube_policy_bytes=policies_bytes[0],
            point_policy_bytes=policies_bytes[1], config=CFG, n_partitions=4,
        ).toPandas()
        assert list(out.columns) == ["traj_id", "seq", "x", "y", "t"]
        orig = tiny_db.groupby("traj_id")["seq"].agg(["min", "max"])
        got = out.groupby("traj_id")["seq"].agg(["min", "max"])
        pd.testing.assert_frame_equal(got, orig)

    def test_global_budget_approximate(self, spark, tiny_db, policies_bytes):
        df = spark.createDataFrame(tiny_db)
        out = simplify_database_rl_spark(
            df, 0.08, cube_policy_bytes=policies_bytes[0],
            point_policy_bytes=policies_bytes[1], config=CFG, n_partitions=4,
        ).toPandas()
        n, m = len(tiny_db), tiny_db["traj_id"].nunique()
        target = max(2 * m, int(0.08 * n))
        # per-partition rounding and endpoint floors allow small drift
        assert abs(len(out) - target) <= 4 + 2 * m

    def test_ablation_without_policies(self, spark, tiny_db):
        df = spark.createDataFrame(tiny_db)
        out = simplify_database_rl_spark(
            df, 0.05, cube_policy_bytes=None, point_policy_bytes=None,
            config=CFG, use_agent_cube=False, use_agent_point=False, n_partitions=2,
        ).toPandas()
        assert len(out) > 0

    def test_output_subset_of_input(self, spark, tiny_db, policies_bytes):
        df = spark.createDataFrame(tiny_db)
        out = simplify_database_rl_spark(
            df, 0.05, cube_policy_bytes=policies_bytes[0],
            point_policy_bytes=policies_bytes[1], config=CFG, n_partitions=2,
        ).toPandas()
        merged = out.merge(tiny_db, on=["traj_id", "seq", "x", "y", "t"])
        assert len(merged) == len(out)

    def test_deterministic_per_config(self, spark, tiny_db, policies_bytes):
        df = spark.createDataFrame(tiny_db)

        def run():
            return (
                simplify_database_rl_spark(
                    df, 0.05, cube_policy_bytes=policies_bytes[0],
                    point_policy_bytes=policies_bytes[1], config=CFG, n_partitions=2,
                )
                .toPandas().sort_values(["traj_id", "seq"]).reset_index(drop=True)
            )

        pd.testing.assert_frame_equal(run(), run())


class TestDistributedTraining:
    def test_seed_fanout_returns_best(self, spark):
        dbs = [trajectory_db_pandas(profile="chengdu", sf=0.004, seed=s) for s in (1, 2)]
        cube_b, point_b, summary = train_policy_seeds_spark(
            spark, dbs, seeds=[0, 1], ratio=0.1, config=CFG, episodes_per_db=1, delta=10,
        )
        assert set(summary.columns) == {"seed", "best_final_diff"}
        assert len(summary) == 2
        # returned bytes must deserialize into working policies
        cube = DQN.from_bytes(cube_b)
        point = DQN.from_bytes(point_b)
        assert cube.q_values(np.zeros(CUBE_STATE_DIM)).shape == (CUBE_ACTIONS,)
        assert point.q_values(np.zeros(point_state_dim(2))).shape == (2,)
