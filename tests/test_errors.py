"""Unit tests for the SED/PED/DAD/SAD error measures."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core.errors import MEASURES, _anchors_for, point_errors, trajectory_error
from tests.conftest import make_traj


def _one(x, y, t, i, a, b, measure):
    return float(point_errors(
        np.asarray(x, float), np.asarray(y, float), np.asarray(t, float),
        np.array([i]), np.array([a]), np.array([b]), measure,
    )[0])


class TestSED:
    def test_collinear_constant_speed_is_zero(self):
        # Point exactly on the segment at its synchronized time.
        x, y, t = [0.0, 1.0, 2.0], [0.0, 1.0, 2.0], [0.0, 1.0, 2.0]
        assert _one(x, y, t, 1, 0, 2, "sed") == pytest.approx(0.0)

    def test_known_offset(self):
        # Synchronized position at t=1 is (1, 0); point is at (1, 3).
        x, y, t = [0.0, 1.0, 2.0], [0.0, 3.0, 0.0], [0.0, 1.0, 2.0]
        assert _one(x, y, t, 1, 0, 2, "sed") == pytest.approx(3.0)

    def test_nonuniform_time(self):
        # t=1 of [0, 4] → quarter along the segment (0,0)→(4,0) = (1,0).
        x, y, t = [0.0, 3.0, 4.0], [0.0, 0.0, 0.0], [0.0, 1.0, 4.0]
        assert _one(x, y, t, 1, 0, 2, "sed") == pytest.approx(2.0)

    def test_degenerate_time_uses_midpoint(self):
        x, y, t = [0.0, 1.0, 2.0], [0.0, 1.0, 0.0], [0.0, 0.0, 0.0]
        # midpoint of segment is (1, 0); point is (1, 1)
        assert _one(x, y, t, 1, 0, 2, "sed") == pytest.approx(1.0)

    def test_dwell_point_large_sed(self):
        # Object waits at origin then jumps: synchronized point moves on.
        x, y, t = [0.0, 0.0, 10.0], [0.0, 0.0, 0.0], [0.0, 5.0, 10.0]
        assert _one(x, y, t, 1, 0, 2, "sed") == pytest.approx(5.0)


class TestPED:
    def test_on_segment_zero(self):
        x, y, t = [0.0, 2.0, 4.0], [0.0, 0.0, 0.0], [0.0, 1.0, 2.0]
        assert _one(x, y, t, 1, 0, 2, "ped") == pytest.approx(0.0)

    def test_perpendicular_offset(self):
        x, y, t = [0.0, 2.0, 4.0], [0.0, 5.0, 0.0], [0.0, 1.0, 2.0]
        assert _one(x, y, t, 1, 0, 2, "ped") == pytest.approx(5.0)

    def test_projection_clamped_to_endpoint(self):
        # Point "behind" segment start: distance to the start point.
        x, y, t = [0.0, -3.0, 4.0], [0.0, 4.0, 0.0], [0.0, 1.0, 2.0]
        assert _one(x, y, t, 1, 0, 2, "ped") == pytest.approx(5.0)

    def test_ped_time_invariant(self):
        x, y, t = [0.0, 2.0, 4.0], [0.0, 5.0, 0.0], [0.0, 1.0, 2.0]
        t2 = [0.0, 1.9, 2.0]
        assert _one(x, y, t, 1, 0, 2, "ped") == _one(x, y, t2, 1, 0, 2, "ped")


class TestDAD:
    def test_same_direction_zero(self):
        x, y, t = [0.0, 1.0, 2.0], [0.0, 1.0, 2.0], [0.0, 1.0, 2.0]
        assert _one(x, y, t, 1, 0, 2, "dad") == pytest.approx(0.0)

    def test_right_angle(self):
        # Anchor heads +x; original segment at p1 heads +y.
        x, y, t = [0.0, 1.0, 1.0, 4.0], [0.0, 0.0, 1.0, 0.0], [0.0, 1.0, 2.0, 3.0]
        assert _one(x, y, t, 1, 0, 3, "dad") == pytest.approx(np.pi / 2)

    def test_opposite_direction_pi(self):
        x, y, t = [0.0, 2.0, 1.0, 4.0], [0.0, 0.0, 0.0, 0.0], [0.0, 1.0, 2.0, 3.0]
        assert _one(x, y, t, 1, 0, 3, "dad") == pytest.approx(np.pi)

    def test_dwell_step_direction_free(self):
        # Zero-length original step at p1 → no direction → error 0.
        x, y, t = [0.0, 1.0, 1.0, 4.0], [0.0, 2.0, 2.0, 0.0], [0.0, 1.0, 2.0, 3.0]
        i1 = _one(x, y, t, 1, 0, 3, "dad")
        # p1→p2 is zero length
        assert i1 == pytest.approx(0.0)

    def test_bounded_by_pi(self):
        x, y, t = make_traj(40, seed=5)
        i = np.arange(1, 38)
        e = point_errors(x, y, t, i, np.zeros_like(i), np.full_like(i, 39), "dad")
        assert np.all(e >= 0) and np.all(e <= np.pi + 1e-9)


class TestSAD:
    def test_constant_speed_zero(self):
        x, y, t = [0.0, 1.0, 2.0], [0.0, 0.0, 0.0], [0.0, 1.0, 2.0]
        assert _one(x, y, t, 1, 0, 2, "sad") == pytest.approx(0.0)

    def test_known_speed_difference(self):
        # Anchor speed = 4/2 = 2; original step p1→p2 speed = 3/1 = 3.
        x, y, t = [0.0, 1.0, 4.0], [0.0, 0.0, 0.0], [0.0, 1.0, 2.0]
        assert _one(x, y, t, 1, 0, 2, "sad") == pytest.approx(1.0)

    def test_nonnegative(self):
        x, y, t = make_traj(40, seed=6)
        i = np.arange(1, 38)
        e = point_errors(x, y, t, i, np.zeros_like(i), np.full_like(i, 39), "sad")
        assert np.all(e >= 0)


@pytest.mark.parametrize("measure", MEASURES)
class TestGenericProperties:
    def test_vectorized_matches_scalar(self, measure):
        x, y, t = make_traj(30, seed=1)
        i = np.arange(1, 29)
        a = np.zeros_like(i)
        b = np.full_like(i, 29)
        vec = point_errors(x, y, t, i, a, b, measure)
        for k in range(0, 28, 5):
            assert vec[k] == pytest.approx(_one(x, y, t, i[k], 0, 29, measure))

    def test_errors_nonnegative(self, measure):
        x, y, t = make_traj(60, seed=2)
        i = np.arange(1, 59)
        e = point_errors(x, y, t, i, np.zeros_like(i), np.full_like(i, 59), measure)
        assert np.all(e >= 0)

    def test_trajectory_error_zero_when_nothing_dropped(self, measure):
        x, y, t = make_traj(20, seed=3)
        assert trajectory_error(x, y, t, np.arange(20), measure) == 0.0

    def test_trajectory_error_is_max_of_point_errors(self, measure):
        x, y, t = make_traj(25, seed=4)
        keep = np.array([0, 7, 15, 24])
        i, a, b = _anchors_for(keep, 25)
        expected = point_errors(x, y, t, i, a, b, measure).max()
        assert trajectory_error(x, y, t, keep, measure) == pytest.approx(float(expected))

    def test_keeping_more_points_never_increases_error(self, measure):
        x, y, t = make_traj(40, seed=8)
        sparse = np.array([0, 20, 39])
        dense = np.array([0, 10, 20, 30, 39])
        assert trajectory_error(x, y, t, dense, measure) <= trajectory_error(
            x, y, t, sparse, measure
        ) + 1e-9

    def test_unknown_measure_raises(self, measure):
        x, y, t = make_traj(10, seed=9)
        with pytest.raises(ValueError):
            point_errors(x, y, t, np.array([1]), np.array([0]), np.array([9]), "nope")


class TestAnchors:
    def test_anchors_cover_all_dropped(self):
        keep = np.array([0, 3, 9])
        i, a, b = _anchors_for(keep, 10)
        assert list(i) == [1, 2, 4, 5, 6, 7, 8]
        assert list(a) == [0, 0, 3, 3, 3, 3, 3]
        assert list(b) == [3, 3, 9, 9, 9, 9, 9]

    def test_anchors_empty_when_all_kept(self):
        i, a, b = _anchors_for(np.arange(5), 5)
        assert len(i) == 0


@settings(max_examples=40, deadline=None)
@given(
    n=st.integers(6, 40),
    seed=st.integers(0, 10_000),
    measure=st.sampled_from(MEASURES),
)
def test_random_subsets_error_finite_and_nonneg(n, seed, measure):
    x, y, t = make_traj(n, seed=seed)
    g = np.random.default_rng(seed)
    interior = g.choice(np.arange(1, n - 1), size=min(3, n - 2), replace=False)
    keep = np.unique(np.concatenate([[0, n - 1], interior]))
    e = trajectory_error(x, y, t, keep, measure)
    assert np.isfinite(e) and e >= 0
