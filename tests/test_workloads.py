"""Tests for query workload generation (distributions + boxes)."""
import numpy as np
import pytest

from repro.synth_data import TRAJ_EXTENT
from repro.workloads.distributions import (
    DISTRIBUTIONS,
    query_centers,
    range_query_workload,
    workload_to_pandas,
)


@pytest.mark.parametrize("dist", DISTRIBUTIONS)
class TestCenters:
    def test_shape(self, dist, tiny_db):
        c = query_centers(tiny_db, n=40, distribution=dist, seed=0)
        assert c.shape == (40, 3)

    def test_deterministic(self, dist, tiny_db):
        a = query_centers(tiny_db, n=20, distribution=dist, seed=3)
        b = query_centers(tiny_db, n=20, distribution=dist, seed=3)
        assert np.allclose(a, b)

    def test_seed_changes_sample(self, dist, tiny_db):
        a = query_centers(tiny_db, n=20, distribution=dist, seed=3)
        b = query_centers(tiny_db, n=20, distribution=dist, seed=4)
        assert not np.allclose(a, b)


class TestDistributionShapes:
    def test_data_centers_are_data_points(self, tiny_db):
        c = query_centers(tiny_db, n=50, distribution="data", seed=1)
        pts = set(zip(tiny_db["x"].round(6), tiny_db["y"].round(6)))
        hits = sum((round(x, 6), round(y, 6)) in pts for x, y, _ in c)
        assert hits == 50

    def test_gaussian_centers_concentrate_mid_extent(self, tiny_db):
        c = query_centers(tiny_db, n=2000, distribution="gaussian", mu=0.5, sigma=0.1, seed=1)
        assert abs(c[:, 0].mean() - 0.5 * TRAJ_EXTENT) < 0.05 * TRAJ_EXTENT

    def test_gaussian_mu_shifts_centers(self, tiny_db):
        lo = query_centers(tiny_db, n=500, distribution="gaussian", mu=0.2, seed=1)
        hi = query_centers(tiny_db, n=500, distribution="gaussian", mu=0.8, seed=1)
        assert lo[:, 0].mean() < hi[:, 0].mean()

    def test_zipf_concentrates_with_large_a(self, tiny_db):
        mild = query_centers(tiny_db, n=1000, distribution="zipf", zipf_a=1.0, seed=1)
        harsh = query_centers(tiny_db, n=1000, distribution="zipf", zipf_a=8.0, seed=1)

        def top_cell_share(c):
            cells = (c[:, 0] // (TRAJ_EXTENT / 16)).astype(int) * 16 + (
                c[:, 1] // (TRAJ_EXTENT / 16)
            ).astype(int)
            _, counts = np.unique(cells, return_counts=True)
            return counts.max() / len(c)

        assert top_cell_share(harsh) > top_cell_share(mild)

    def test_real_centers_near_endpoints(self, tiny_db):
        c = query_centers(tiny_db, n=200, distribution="real", jitter=100.0, seed=1)
        ends = tiny_db.groupby("traj_id").agg(
            first=("seq", "idxmin"), last=("seq", "idxmax")
        )
        anchor = tiny_db.loc[
            np.concatenate([ends["first"].to_numpy(), ends["last"].to_numpy()])
        ][["x", "y"]].to_numpy()
        d = np.min(
            np.linalg.norm(c[:, None, :2] - anchor[None, :, :], axis=2), axis=1
        )
        assert np.median(d) < 500.0

    def test_unknown_distribution_raises(self, tiny_db):
        with pytest.raises(ValueError):
            query_centers(tiny_db, n=5, distribution="nope")


class TestBoxes:
    def test_box_geometry(self, tiny_db):
        b = range_query_workload(
            tiny_db, n_queries=25, spatial=500.0, duration=3600.0, seed=0
        )
        assert b.shape == (25, 6)
        assert np.allclose(b[:, 1] - b[:, 0], 500.0)
        assert np.allclose(b[:, 3] - b[:, 2], 500.0)
        assert np.allclose(b[:, 5] - b[:, 4], 3600.0)

    def test_boxes_centered_on_centers(self, tiny_db):
        b = range_query_workload(
            tiny_db, n_queries=10, distribution="data", spatial=100.0, duration=60.0, seed=7
        )
        c = query_centers(tiny_db, n=10, distribution="data", seed=7)
        assert np.allclose((b[:, 0] + b[:, 1]) / 2, c[:, 0])
        assert np.allclose((b[:, 4] + b[:, 5]) / 2, c[:, 2])

    def test_workload_to_pandas_roundtrip(self, tiny_db):
        b = range_query_workload(tiny_db, n_queries=9, seed=0)
        w = workload_to_pandas(b)
        assert list(w["qid"]) == list(range(9))
        assert np.allclose(w[["x_min", "x_max", "y_min", "y_max", "t_min", "t_max"]].to_numpy(), b)
