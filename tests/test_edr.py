"""Tests for vectorized EDR against a brute-force reference DP."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.queries.edr import edr


def edr_reference(xa, ya, xb, yb, eps):
    """Textbook O(n·m) scalar DP."""
    n, m = len(xa), len(xb)
    dp = [[0] * (m + 1) for _ in range(n + 1)]
    for i in range(n + 1):
        dp[i][0] = i
    for j in range(m + 1):
        dp[0][j] = j
    for i in range(1, n + 1):
        for j in range(1, m + 1):
            match = abs(xa[i - 1] - xb[j - 1]) <= eps and abs(ya[i - 1] - yb[j - 1]) <= eps
            dp[i][j] = min(
                dp[i - 1][j - 1] + (0 if match else 1),
                dp[i - 1][j] + 1,
                dp[i][j - 1] + 1,
            )
    return dp[n][m]


class TestEDRBasics:
    def test_identical_zero(self):
        x = np.arange(10.0)
        assert edr(x, x, x, x, eps=0.1) == 0

    def test_empty_vs_seq(self):
        x = np.arange(5.0)
        e = np.array([])
        assert edr(e, e, x, x, eps=1.0) == 5
        assert edr(x, x, e, e, eps=1.0) == 5

    def test_single_substitution(self):
        xa = np.array([0.0, 1.0, 2.0])
        xb = np.array([0.0, 50.0, 2.0])
        y = np.zeros(3)
        assert edr(xa, y, xb, y, eps=1.0) == 1

    def test_insertion(self):
        xa = np.array([0.0, 1.0, 2.0, 3.0])
        xb = np.array([0.0, 1.0, 3.0])
        y4, y3 = np.zeros(4), np.zeros(3)
        assert edr(xa, y4, xb, y3, eps=0.1) == 1

    def test_eps_widens_matching(self):
        xa = np.array([0.0, 1.0])
        xb = np.array([0.4, 1.4])
        y = np.zeros(2)
        assert edr(xa, y, xb, y, eps=0.1) == 2
        assert edr(xa, y, xb, y, eps=0.5) == 0

    def test_bounded_by_max_len(self):
        g = np.random.default_rng(0)
        xa, ya = g.normal(size=20), g.normal(size=20)
        xb, yb = g.normal(size=30) + 100, g.normal(size=30)
        assert edr(xa, ya, xb, yb, eps=0.01) == 30  # no matches → max(m, n)...

    def test_symmetry(self):
        g = np.random.default_rng(1)
        xa, ya = g.normal(size=12), g.normal(size=12)
        xb, yb = g.normal(size=9), g.normal(size=9)
        assert edr(xa, ya, xb, yb, eps=1.0) == edr(xb, yb, xa, ya, eps=1.0)


@settings(max_examples=60, deadline=None)
@given(
    n=st.integers(0, 12),
    m=st.integers(0, 12),
    seed=st.integers(0, 10_000),
    eps=st.floats(0.05, 2.0),
)
def test_matches_reference_dp(n, m, seed, eps):
    g = np.random.default_rng(seed)
    xa, ya = g.normal(size=n), g.normal(size=n)
    xb, yb = g.normal(size=m), g.normal(size=m)
    assert edr(xa, ya, xb, yb, eps=eps) == edr_reference(xa, ya, xb, yb, eps)
