"""Tests for the experiment harness (table reproductions)."""
import numpy as np
import pytest

from repro.core.rl4qdts import RL4QDTSConfig
from repro.experiments import (
    ALL_BASELINES,
    SKYLINE_BASELINES,
    evaluate_query_tasks,
    simplify_with,
    table1_statistics,
)

CFG = RL4QDTSConfig(start_level=3, max_depth=5, n_queries=20, n_query_centers=200,
                    query_spatial=1000.0, query_duration=6 * 3600.0, seed=0)


class TestRegistry:
    def test_25_baseline_adaptations(self):
        # 3 algorithms × 2 modes × 4 measures + Span-Search = 25 (paper V-A)
        assert len(ALL_BASELINES) == 25
        assert len(set(ALL_BASELINES)) == 25

    def test_skylines_subset_of_all(self):
        assert set(SKYLINE_BASELINES) <= set(ALL_BASELINES)

    @pytest.mark.parametrize("method", ["topdown(E,sed)", "bottomup(W,ped)", "spansearch(E,dad)"])
    def test_simplify_with_baselines(self, tiny_db, method):
        out = simplify_with(tiny_db, 0.1, method)
        assert 0 < len(out) < len(tiny_db)

    @pytest.mark.parametrize(
        "method", ["rl4qdts_wo_both", "rl4qdts_wo_cube", "rl4qdts_wo_point"]
    )
    def test_simplify_with_ablations(self, tiny_db, method):
        out = simplify_with(tiny_db, 0.1, method, config=CFG, policies=(None, None))
        assert 0 < len(out) < len(tiny_db)


class TestTable1:
    def test_all_four_datasets(self):
        t = table1_statistics(sf=0.02)
        assert list(t["dataset"]) == ["geolife", "tdrive", "chengdu", "osm"]

    def test_relative_ordering_matches_paper(self):
        """Table I's qualitative structure: Chengdu has the most (and
        shortest) trajectories, OSM the longest, T-Drive the sparsest
        sampling among the city datasets."""
        t = table1_statistics(sf=0.05).set_index("dataset")
        assert t.loc["chengdu", "n_trajectories"] > t.loc["geolife", "n_trajectories"]
        assert t.loc["chengdu", "avg_points_per_traj"] < t.loc["geolife", "avg_points_per_traj"]
        assert t.loc["osm", "avg_points_per_traj"] > t.loc["geolife", "avg_points_per_traj"]
        assert t.loc["tdrive", "avg_sampling_interval_s"] > t.loc["geolife", "avg_sampling_interval_s"]


class TestEvaluateQueryTasks:
    def test_identical_database_scores_one(self, spark, tiny_db, tiny_boxes):
        scores = evaluate_query_tasks(
            spark, tiny_db, tiny_db.copy(), boxes=tiny_boxes,
            n_query_trajs=2, seed=0,
        )
        for task, val in scores.items():
            assert val == pytest.approx(1.0), task

    def test_simplified_database_scores_in_unit_interval(self, spark, tiny_db, tiny_boxes):
        dprime = simplify_with(tiny_db, 0.1, "topdown(E,sed)")
        scores = evaluate_query_tasks(
            spark, tiny_db, dprime, boxes=tiny_boxes, n_query_trajs=2, seed=0,
            tasks=("range", "knn_edr", "similarity"),
        )
        assert set(scores) == {"range", "knn_edr", "similarity"}
        for val in scores.values():
            assert 0.0 <= val <= 1.0
