"""Tests for the t2vec-lite embedding similarity (DESIGN.md §4)."""
import numpy as np
import pytest

from repro.queries.t2vec import T2VecLite
from tests.conftest import make_traj


@pytest.fixture(scope="module")
def emb():
    return T2VecLite(cell_size=1000.0, dim=16, seed=7)


class TestCells:
    def test_consecutive_duplicates_collapsed(self, emb):
        x = np.array([10.0, 20.0, 30.0, 1500.0])
        y = np.zeros(4)
        assert len(emb.cells(x, y)) == 2

    def test_empty_input(self, emb):
        assert len(emb.cells(np.array([]), np.array([]))) == 0

    def test_out_of_extent_clipped(self, emb):
        toks = emb.cells(np.array([-1e6, 1e9]), np.array([0.0, 0.0]))
        assert np.all(toks >= 0)


class TestEmbedding:
    def test_deterministic(self):
        x = np.array([1000.0, 2500.0, 4000.0])
        y = np.array([500.0, 1500.0, 2500.0])
        a = T2VecLite(seed=7).embed(x, y)
        b = T2VecLite(seed=7).embed(x, y)
        assert np.allclose(a, b)

    def test_distance_self_zero(self, emb):
        x, y, _ = make_traj(50, seed=0)
        assert emb.distance(x, y, x, y) == 0.0

    def test_robust_to_point_dropping(self, emb):
        # The t2vec property the substitution must preserve: heavy
        # subsampling barely changes the embedding, while a genuinely
        # different route lands far away.
        x, y, _ = make_traj(400, seed=1)
        x2, y2, _ = make_traj(400, seed=99)
        x2, y2 = x2 + 20000, y2 + 20000  # different area
        keep = np.arange(0, 400, 10)
        d_sub = emb.distance(x, y, x[keep], y[keep])
        d_other = emb.distance(x, y, x2, y2)
        assert d_sub < d_other * 0.5

    def test_empty_trajectory_embeds_zero(self, emb):
        assert np.allclose(emb.embed(np.array([]), np.array([])), 0.0)

    def test_order_matters(self, emb):
        x, y, _ = make_traj(100, seed=2)
        d = emb.distance(x, y, x[::-1], y[::-1])
        assert d > 0.0
