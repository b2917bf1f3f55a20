"""Tests for the trajectory generators (Table I substitution)."""
import numpy as np
import pandas as pd
import pytest

from repro.synth_data import (
    TRAJ_EXTENT,
    TRAJ_PROFILES,
    TRAJ_TSPAN,
    dataset_statistics,
    profile_hubs,
    trajectories,
    trajectory_db_pandas,
)


@pytest.mark.parametrize("profile", list(TRAJ_PROFILES))
class TestPerProfile:
    def test_schema(self, profile):
        db = trajectory_db_pandas(profile=profile, sf=0.02, seed=0)
        assert list(db.columns) == ["traj_id", "seq", "x", "y", "t"]
        assert db["traj_id"].dtype == np.int64
        assert db["seq"].dtype == np.int64

    def test_seq_contiguous_from_zero(self, profile):
        db = trajectory_db_pandas(profile=profile, sf=0.02, seed=0)
        for _, g in db.groupby("traj_id"):
            assert list(g.sort_values("seq")["seq"]) == list(range(len(g)))

    def test_time_strictly_increasing(self, profile):
        db = trajectory_db_pandas(profile=profile, sf=0.02, seed=0)
        for _, g in db.groupby("traj_id"):
            assert np.all(np.diff(g.sort_values("seq")["t"].to_numpy()) > 0)

    def test_within_extent(self, profile):
        db = trajectory_db_pandas(profile=profile, sf=0.02, seed=0)
        assert db["x"].between(0, TRAJ_EXTENT).all()
        assert db["y"].between(0, TRAJ_EXTENT).all()
        assert db["t"].between(0, TRAJ_TSPAN + 1e6).all()

    def test_deterministic_in_seed(self, profile):
        a = trajectory_db_pandas(profile=profile, sf=0.02, seed=5)
        b = trajectory_db_pandas(profile=profile, sf=0.02, seed=5)
        pd.testing.assert_frame_equal(a, b)

    def test_different_seeds_differ(self, profile):
        a = trajectory_db_pandas(profile=profile, sf=0.02, seed=5)
        b = trajectory_db_pandas(profile=profile, sf=0.02, seed=6)
        assert not a.equals(b)

    def test_sf_scales_trajectory_count(self, profile):
        small = trajectory_db_pandas(profile=profile, sf=0.02, seed=0)
        big = trajectory_db_pandas(profile=profile, sf=0.04, seed=0)
        assert big["traj_id"].nunique() >= small["traj_id"].nunique()


class TestProfileStatistics:
    """The distinguishing Table-I statistics must match the profiles."""

    @pytest.mark.parametrize(
        "profile,lo,hi",
        [("geolife", 1.0, 5.0), ("tdrive", 170.0, 185.0),
         ("chengdu", 2.0, 4.0), ("osm", 50.0, 58.0)],
    )
    def test_sampling_interval(self, profile, lo, hi):
        db = trajectory_db_pandas(profile=profile, sf=0.05, seed=1)
        st = dataset_statistics(db)
        assert lo <= st["avg_sampling_interval_s"] <= hi

    @pytest.mark.parametrize("profile", list(TRAJ_PROFILES))
    def test_mean_length_order_of_magnitude(self, profile):
        db = trajectory_db_pandas(profile=profile, sf=0.05, seed=1)
        st = dataset_statistics(db)
        expected = TRAJ_PROFILES[profile]["mean_len"]
        assert 0.4 * expected <= st["avg_points_per_traj"] <= 2.5 * expected

    def test_chengdu_shorter_than_osm(self):
        st_c = dataset_statistics(trajectory_db_pandas(profile="chengdu", sf=0.05, seed=1))
        st_o = dataset_statistics(trajectory_db_pandas(profile="osm", sf=0.2, seed=1))
        assert st_c["avg_points_per_traj"] < st_o["avg_points_per_traj"]


class TestHubs:
    def test_hubs_stable_across_calls(self):
        a, _ = profile_hubs("geolife")
        b, _ = profile_hubs("geolife")
        assert np.allclose(a, b)

    def test_hubs_differ_across_profiles(self):
        a, _ = profile_hubs("geolife")
        b, _ = profile_hubs("tdrive")
        assert not np.allclose(a, b)

    def test_popularity_normalized_descending(self):
        _, pop = profile_hubs("chengdu")
        assert pop.sum() == pytest.approx(1.0)
        assert np.all(np.diff(pop) <= 0)

    def test_data_concentrates_near_hubs(self):
        db = trajectory_db_pandas(profile="geolife", sf=0.05, seed=2)
        hubs, _ = profile_hubs("geolife")
        pts = db[["x", "y"]].to_numpy()
        d = np.min(
            np.linalg.norm(pts[:, None, :] - hubs[None, :, :], axis=2), axis=1
        )
        # more than a third of points within 3 km of some hub — the
        # concentration real GPS corpora show.
        assert (d < 3000).mean() > 0.33


class TestHeterogeneity:
    def test_dwell_fractions_vary_across_trajectories(self):
        db = trajectory_db_pandas(profile="geolife", sf=0.1, seed=0)
        frac = db.groupby("traj_id").apply(
            lambda g: float(
                (np.hypot(np.diff(g["x"].to_numpy()), np.diff(g["y"].to_numpy())) < 1.0).mean()
            ),
            include_groups=False,
        )
        assert frac.max() - frac.min() > 0.2  # the paper's Issue-1 setup


class TestSparkSide:
    def test_trajectories_spark_matches_pandas(self, spark):
        pdf = trajectory_db_pandas(profile="chengdu", sf=0.005, seed=0)
        sdf = trajectories(spark, profile="chengdu", sf=0.005, seed=0)
        got = sdf.toPandas().sort_values(["traj_id", "seq"]).reset_index(drop=True)
        pd.testing.assert_frame_equal(got, pdf)
