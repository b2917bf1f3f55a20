"""Span-Search baseline (Long, Wong & Jagadish, PVLDB'14) — DAD only.

Span-Search solves min-error direction-preserving simplification under
a size budget by searching over the error tolerance: for a candidate
tolerance ε, an error-bounded one-pass split packs as many original
points under each simplified segment as DAD ≤ ε allows; binary search
on ε finds the smallest tolerance whose split fits the budget. (The
original searches the spans of sorted candidate errors; continuous
binary search to 1e-4 rad converges to the same split — documented
approximation, DESIGN.md §4.) Leftover budget is spent by Top-Down DAD
insertions seeded from the split, so the full budget is used, matching
how the paper adapts budgeted baselines.
"""
from __future__ import annotations

import heapq

import numpy as np

from repro.core.errors import point_errors


def _seg_err(x, y, t, a: int, b: int) -> tuple[float, int]:
    """(max DAD error, argmax point) of segment (a, b) over covered pts."""
    i = np.arange(a, b)
    e = point_errors(x, y, t, i, np.full(len(i), a), np.full(len(i), b), "dad")
    j = int(np.argmax(e))
    return float(e[j]), int(i[j])


def _seg_ok(x, y, t, a: int, b: int, eps: float) -> bool:
    return _seg_err(x, y, t, a, b)[0] <= eps


def _greedy_split(x, y, t, eps: float) -> np.ndarray:
    """Error-bounded split: exponential probe + binary search for the
    farthest endpoint each segment can reach under DAD ≤ eps."""
    n = len(x)
    keep = [0]
    a = 0
    while a < n - 1:
        step = 1
        while a + step * 2 <= n - 1 and _seg_ok(x, y, t, a, a + step * 2, eps):
            step *= 2
        lo, hi = a + step, min(a + step * 2, n - 1)
        # largest b in [lo, hi] with seg (a, b) ok; lo is known-ok (or a+1)
        if not _seg_ok(x, y, t, a, lo, eps):
            lo = a + 1  # even one step violates: forced single-step segment
        else:
            while lo < hi:
                mid = (lo + hi + 1) // 2
                if _seg_ok(x, y, t, a, mid, eps):
                    lo = mid
                else:
                    hi = mid - 1
        keep.append(lo)
        a = lo
    return np.array(sorted(set(keep)), dtype=np.int64)


def _interior_argmax(x, y, t, a: int, b: int) -> tuple[float, int]:
    """(max DAD error, argmax) over *interior* points of (a, b) — the
    insertion candidates. (``_seg_err`` includes point ``a``, which is
    correct for the error bound but already kept, so not insertable.)"""
    i = np.arange(a + 1, b)
    e = point_errors(x, y, t, i, np.full(len(i), a), np.full(len(i), b), "dad")
    j = int(np.argmax(e))
    return float(e[j]), int(i[j])


def _topdown_fill(x, y, t, keep: np.ndarray, budget: int) -> np.ndarray:
    """Insert max-DAD-error points into the current keep set (Top-Down
    style) until ``budget`` points are kept."""
    kept = set(keep.tolist())
    heap: list = []
    ks = sorted(kept)
    for a, b in zip(ks[:-1], ks[1:]):
        if b - a > 1:
            e, i = _interior_argmax(x, y, t, a, b)
            heapq.heappush(heap, (-e, a, b, i))
    while len(kept) < budget and heap:
        _, a, b, i = heapq.heappop(heap)
        kept.add(i)
        for lo, hi in ((a, i), (i, b)):
            if hi - lo > 1:
                e, j = _interior_argmax(x, y, t, lo, hi)
                heapq.heappush(heap, (-e, lo, hi, j))
    return np.array(sorted(kept), dtype=np.int64)


def simplify_spansearch(
    x: np.ndarray, y: np.ndarray, t: np.ndarray, budget: int
) -> np.ndarray:
    """Keep ≤ ``budget`` points (≥ 2) minimizing the DAD tolerance, then
    fill any slack budget with Top-Down DAD insertions."""
    budget = max(2, budget)
    lo, hi = 0.0, float(np.pi)
    keep = np.array([0, len(x) - 1], dtype=np.int64)
    for _ in range(32):
        mid = (lo + hi) / 2.0
        cand = _greedy_split(x, y, t, mid)
        if len(cand) <= budget:
            keep, hi = cand, mid
        else:
            lo = mid
        if hi - lo < 1e-4:
            break
    if len(keep) < budget:
        keep = _topdown_fill(x, y, t, keep, budget)
    return keep
