"""Top-Down EDTS baseline (Hershberger & Snoeyink's budget variant of
Douglas–Peucker).

Start each simplified trajectory from its two endpoints; repeatedly
*insert* the not-yet-kept point with the largest error w.r.t. its
current anchor segment, until the budget is exhausted. A max-heap over
interval maxima makes each insertion O(log #intervals + interval scan).

The same engine serves both adaptations of the paper's Section V-A:
"E" calls it with a single trajectory and a per-trajectory budget; "W"
calls it with the whole database and the global budget, so the heap
competes points *across* trajectories (collective simplification).
"""
from __future__ import annotations

import heapq

import numpy as np

from repro.core.errors import point_errors

Traj = tuple[np.ndarray, np.ndarray, np.ndarray]  # (x, y, t)


def _interval_max(x, y, t, a: int, b: int, measure: str) -> tuple[float, int]:
    """(max error, argmax index) over interior points of interval (a, b)."""
    if b - a <= 1:
        return -1.0, -1
    i = np.arange(a + 1, b)
    e = point_errors(x, y, t, i, np.full(len(i), a), np.full(len(i), b), measure)
    j = int(np.argmax(e))
    return float(e[j]), int(i[j])


def topdown_select(trajs: list[Traj], budget: int, measure: str) -> list[np.ndarray]:
    """Kept-index arrays for each trajectory under a *total* point budget.

    Endpoints are always kept (the floor is 2 points per trajectory,
    even if ``budget < 2 * len(trajs)`` — same convention as the paper's
    Algorithm 1, which seeds D' with all endpoints)."""
    keeps = [{0, len(tr[0]) - 1} for tr in trajs]
    kept = sum(len(k) for k in keeps)
    heap: list = []
    for ti, (x, y, t) in enumerate(trajs):
        err, idx = _interval_max(x, y, t, 0, len(x) - 1, measure)
        if idx >= 0:
            heapq.heappush(heap, (-err, ti, 0, len(x) - 1, idx))
    while kept < budget and heap:
        _, ti, a, b, i = heapq.heappop(heap)
        keeps[ti].add(i)
        kept += 1
        x, y, t = trajs[ti]
        for lo, hi in ((a, i), (i, b)):
            err, idx = _interval_max(x, y, t, lo, hi, measure)
            if idx >= 0:
                heapq.heappush(heap, (-err, ti, lo, hi, idx))
    return [np.array(sorted(k), dtype=np.int64) for k in keeps]


def simplify_topdown(
    x: np.ndarray, y: np.ndarray, t: np.ndarray, budget: int, measure: str
) -> np.ndarray:
    """Per-trajectory Top-Down: keep ``budget`` points (≥ 2)."""
    return topdown_select([(x, y, t)], max(2, budget), measure)[0]
