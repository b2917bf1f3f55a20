"""Tests for the database-level E/W adaptations and their Spark wrapper."""
import numpy as np
import pandas as pd
import pytest

from repro.baselines.adaptations import (
    METHODS,
    MODES,
    simplify_database_pandas,
    simplify_database_spark,
)


def _check_valid_simplification(db: pd.DataFrame, out: pd.DataFrame):
    """Endpoints kept, output ⊆ input, per-trajectory floor of 2."""
    orig = db.groupby("traj_id")["seq"].agg(["min", "max"])
    got = out.groupby("traj_id")["seq"].agg(["min", "max", "count"])
    assert set(got.index) == set(orig.index)
    for tid in orig.index:
        assert got.loc[tid, "min"] == orig.loc[tid, "min"]
        assert got.loc[tid, "max"] == orig.loc[tid, "max"]
        assert got.loc[tid, "count"] >= 2
    merged = out.merge(db, on=["traj_id", "seq", "x", "y", "t"])
    assert len(merged) == len(out)


class TestPandasE:
    @pytest.mark.parametrize("method", ["topdown", "bottomup"])
    @pytest.mark.parametrize("measure", ["sed", "ped", "dad", "sad"])
    def test_valid_and_budgeted(self, tiny_db, method, measure):
        out = simplify_database_pandas(tiny_db, 0.1, method=method, measure=measure, mode="E")
        _check_valid_simplification(tiny_db, out)
        # per-trajectory budgets sum to roughly the global one
        assert len(out) <= 0.1 * len(tiny_db) + 2 * tiny_db["traj_id"].nunique()

    def test_rlts_runs(self, tiny_db):
        out = simplify_database_pandas(tiny_db, 0.1, method="rlts", measure="sed", mode="E")
        _check_valid_simplification(tiny_db, out)

    def test_spansearch_runs(self, tiny_db):
        out = simplify_database_pandas(tiny_db, 0.1, method="spansearch", measure="dad", mode="E")
        _check_valid_simplification(tiny_db, out)

    def test_uniform_ratio_per_trajectory(self, tiny_db):
        out = simplify_database_pandas(tiny_db, 0.2, method="topdown", measure="sed", mode="E")
        sizes_in = tiny_db.groupby("traj_id").size()
        sizes_out = out.groupby("traj_id").size()
        for tid in sizes_in.index:
            assert sizes_out[tid] == max(2, int(round(0.2 * sizes_in[tid])))


class TestPandasW:
    @pytest.mark.parametrize("method", ["topdown", "bottomup"])
    def test_global_budget_exact(self, tiny_db, method):
        out = simplify_database_pandas(tiny_db, 0.1, method=method, measure="sed", mode="W")
        _check_valid_simplification(tiny_db, out)
        expected = max(2 * tiny_db["traj_id"].nunique(), int(round(0.1 * len(tiny_db))))
        assert len(out) == expected

    def test_w_allocates_nonuniformly(self, tiny_db):
        out = simplify_database_pandas(tiny_db, 0.1, method="topdown", measure="sed", mode="W")
        sizes_in = tiny_db.groupby("traj_id").size()
        ratios = (out.groupby("traj_id").size() / sizes_in).dropna()
        assert ratios.max() - ratios.min() > 0.01  # collective ≠ uniform

    def test_rlts_w_runs(self, tiny_db):
        out = simplify_database_pandas(tiny_db, 0.1, method="rlts", measure="sed", mode="W")
        _check_valid_simplification(tiny_db, out)


class TestValidation:
    def test_unknown_method_raises(self, tiny_db):
        with pytest.raises(ValueError):
            simplify_database_pandas(tiny_db, 0.1, method="magic")

    def test_unknown_mode_raises(self, tiny_db):
        with pytest.raises(ValueError):
            simplify_database_pandas(tiny_db, 0.1, mode="X")

    def test_spansearch_w_rejected(self, tiny_db):
        with pytest.raises(ValueError):
            simplify_database_pandas(tiny_db, 0.1, method="spansearch", measure="dad", mode="W")

    def test_spansearch_non_dad_rejected(self, tiny_db):
        with pytest.raises(ValueError):
            simplify_database_pandas(tiny_db, 0.1, method="spansearch", measure="sed", mode="E")

    def test_registry_constants(self):
        assert set(METHODS) == {"topdown", "bottomup", "rlts", "spansearch"}
        assert set(MODES) == {"E", "W"}


class TestSparkWrapper:
    @pytest.mark.parametrize("mode", MODES)
    def test_spark_schema_and_validity(self, spark, tiny_db, mode):
        df = spark.createDataFrame(tiny_db)
        out = simplify_database_spark(df, 0.1, method="topdown", measure="sed",
                                      mode=mode, n_partitions=4).toPandas()
        assert list(out.columns) == ["traj_id", "seq", "x", "y", "t"]
        _check_valid_simplification(tiny_db, out)

    def test_spark_budget_close_to_ratio(self, spark, tiny_db):
        df = spark.createDataFrame(tiny_db)
        out = simplify_database_spark(df, 0.1, method="bottomup", measure="ped",
                                      mode="W", n_partitions=4).toPandas()
        floor = 2 * tiny_db["traj_id"].nunique()
        assert len(out) <= max(floor, int(0.1 * len(tiny_db))) + 4 * 2
        assert len(out) >= min(floor, int(0.05 * len(tiny_db)))

    def test_spark_e_mode_matches_pandas(self, spark, tiny_db):
        # E mode is per-trajectory, so partitioning cannot change results.
        df = spark.createDataFrame(tiny_db)
        got = (
            simplify_database_spark(df, 0.1, method="topdown", measure="sed",
                                    mode="E", n_partitions=4)
            .toPandas().sort_values(["traj_id", "seq"]).reset_index(drop=True)
        )
        want = (
            simplify_database_pandas(tiny_db, 0.1, method="topdown", measure="sed", mode="E")
            .sort_values(["traj_id", "seq"]).reset_index(drop=True)
        )
        pd.testing.assert_frame_equal(got, want)

    def test_spark_rlts_ships_policy(self, spark, tiny_db):
        df = spark.createDataFrame(tiny_db)
        out = simplify_database_spark(df, 0.1, method="rlts", measure="sed",
                                      mode="E", n_partitions=2).toPandas()
        _check_valid_simplification(tiny_db, out)
