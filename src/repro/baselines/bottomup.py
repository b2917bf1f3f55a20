"""Bottom-Up EDTS baseline (Marteau & Ménier style).

Start from the full trajectory; repeatedly *drop* the interior point
whose removal error (error of the point w.r.t. the segment joining its
current kept neighbours) is smallest, until the budget is met. A lazy
min-heap with version counters plus doubly-linked kept lists gives
O(log N) per drop; dropping a point refreshes only its two neighbours.

Like ``topdown``, one engine serves both the "E" (per-trajectory) and
"W" (whole-database, collective) adaptations.
"""
from __future__ import annotations

import heapq

import numpy as np

from repro.core.errors import point_errors

Traj = tuple[np.ndarray, np.ndarray, np.ndarray]


def _err(x, y, t, i: int, a: int, b: int, measure: str) -> float:
    return float(
        point_errors(x, y, t, np.array([i]), np.array([a]), np.array([b]), measure)[0]
    )


def bottomup_select(trajs: list[Traj], budget: int, measure: str) -> list[np.ndarray]:
    """Kept-index arrays per trajectory with at most ``budget`` total
    points (floor of 2 per trajectory)."""
    n_tr = len(trajs)
    prevs = [np.arange(-1, len(tr[0]) - 1) for tr in trajs]
    nexts = [np.arange(1, len(tr[0]) + 1) for tr in trajs]
    alive = [np.ones(len(tr[0]), dtype=bool) for tr in trajs]
    counts = [len(tr[0]) for tr in trajs]
    version = [np.zeros(len(tr[0]), dtype=np.int64) for tr in trajs]
    kept = sum(counts)
    heap: list = []
    for ti, (x, y, t) in enumerate(trajs):
        for i in range(1, len(x) - 1):
            heapq.heappush(heap, (_err(x, y, t, i, i - 1, i + 1, measure), ti, i, 0))
    budget = max(budget, 2 * n_tr)
    while kept > budget and heap:
        e, ti, i, ver = heapq.heappop(heap)
        if not alive[ti][i] or version[ti][i] != ver:
            continue
        if counts[ti] <= 2:
            continue
        x, y, t = trajs[ti]
        p, nx = int(prevs[ti][i]), int(nexts[ti][i])
        alive[ti][i] = False
        counts[ti] -= 1
        kept -= 1
        nexts[ti][p] = nx
        prevs[ti][nx] = p
        for j in (p, nx):
            if 0 < j < len(x) - 1 and alive[ti][j]:
                version[ti][j] += 1
                heapq.heappush(
                    heap,
                    (
                        _err(x, y, t, j, int(prevs[ti][j]), int(nexts[ti][j]), measure),
                        ti,
                        j,
                        int(version[ti][j]),
                    ),
                )
    return [np.nonzero(a)[0].astype(np.int64) for a in alive]


def simplify_bottomup(
    x: np.ndarray, y: np.ndarray, t: np.ndarray, budget: int, measure: str
) -> np.ndarray:
    """Per-trajectory Bottom-Up: keep ``budget`` points (≥ 2)."""
    return bottomup_select([(x, y, t)], max(2, budget), measure)[0]
