"""EDR — Edit Distance on Real sequences (Chen et al., SIGMOD'05).

EDR between two point sequences counts the minimum number of edit
operations (insert / delete / substitute) needed to align them, where
two points "match" (substitution cost 0) iff both coordinate deltas are
within the matching threshold ε. The paper uses EDR with a 2 km
threshold as the non-learning kNN dissimilarity.

The DP is vectorized row-wise in numpy; the within-row dependency
``dp[j] = min(cand[j], dp[j-1] + 1)`` is solved exactly with the prefix
trick ``dp = min-accumulate(cand − j) + j`` (both forms equal
``min_k≤j (cand[k] + (j − k))``).
"""
from __future__ import annotations

import numpy as np


def edr(
    xa: np.ndarray, ya: np.ndarray, xb: np.ndarray, yb: np.ndarray, *, eps: float
) -> int:
    """EDR between sequences A (xa, ya) and B (xb, yb)."""
    n, m = len(xa), len(xb)
    if n == 0:
        return m
    if m == 0:
        return n
    xb = np.asarray(xb, dtype=np.float64)
    yb = np.asarray(yb, dtype=np.float64)
    prev = np.arange(m + 1, dtype=np.float64)  # dp row for i = 0
    j_idx = np.arange(m + 1, dtype=np.float64)
    for i in range(1, n + 1):
        match = (np.abs(xa[i - 1] - xb) <= eps) & (np.abs(ya[i - 1] - yb) <= eps)
        sub = np.where(match, 0.0, 1.0)
        cand = np.empty(m + 1, dtype=np.float64)
        cand[0] = i  # delete all of A[:i]
        cand[1:] = np.minimum(prev[:-1] + sub, prev[1:] + 1.0)
        prev = np.minimum.accumulate(cand - j_idx) + j_idx
    return int(prev[m])
