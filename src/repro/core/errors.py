"""Trajectory simplification error measures: SED, PED, DAD, SAD.

All four measures are defined per the paper's Section III-A (and the
evaluation paper of Zhang et al., PVLDB'18): the error of a point ``p_i``
with respect to its *anchor segment* ``(p_a, p_b)`` (the simplified
segment that covers it), then per-segment and per-trajectory errors are
maxima over covered points / segments (Eqs. 1–2).

Everything here is vectorized numpy over *index arrays into one
trajectory's point arrays* — the same kernels serve Top-Down, Bottom-Up,
RLTS+, Span-Search, and the Agent-Point state construction (``v_s``).
"""
from __future__ import annotations

import numpy as np

MEASURES = ("sed", "ped", "dad", "sad")

_EPS = 1e-12


def point_errors(
    x: np.ndarray,
    y: np.ndarray,
    t: np.ndarray,
    i: np.ndarray,
    a: np.ndarray,
    b: np.ndarray,
    measure: str,
) -> np.ndarray:
    """Error of each point ``i`` w.r.t. its anchor segment ``(a, b)``.

    ``x, y, t`` are the full trajectory arrays; ``i``, ``a``, ``b`` are
    equal-length integer index arrays with ``a <= i <= b`` (DAD/SAD use
    the original segment ``(i, i+1)`` so require ``i < len(x) - 1``;
    callers pass ``i`` of dropped interior points, which satisfies this).
    """
    i = np.asarray(i, dtype=np.int64)
    a = np.asarray(a, dtype=np.int64)
    b = np.asarray(b, dtype=np.int64)
    if measure == "sed":
        return _sed(x, y, t, i, a, b)
    if measure == "ped":
        return _ped(x, y, i, a, b)
    if measure == "dad":
        return _dad(x, y, i, a, b)
    if measure == "sad":
        return _sad(x, y, t, i, a, b)
    raise ValueError(f"unknown measure {measure!r}; expected one of {MEASURES}")


def _sed(x, y, t, i, a, b):
    """Synchronized Euclidean Distance: distance from p_i to the point on
    the anchor segment at time t_i (linear time interpolation)."""
    dt = t[b] - t[a]
    u = np.where(np.abs(dt) > _EPS, (t[i] - t[a]) / np.where(np.abs(dt) > _EPS, dt, 1.0), 0.5)
    sx = x[a] + u * (x[b] - x[a])
    sy = y[a] + u * (y[b] - y[a])
    return np.hypot(x[i] - sx, y[i] - sy)


def _ped(x, y, i, a, b):
    """Perpendicular Euclidean Distance: distance from p_i to the *line
    segment* (p_a, p_b) (projection clamped to the segment)."""
    vx, vy = x[b] - x[a], y[b] - y[a]
    wx, wy = x[i] - x[a], y[i] - y[a]
    denom = vx * vx + vy * vy
    u = np.where(denom > _EPS, (wx * vx + wy * vy) / np.where(denom > _EPS, denom, 1.0), 0.0)
    u = np.clip(u, 0.0, 1.0)
    return np.hypot(wx - u * vx, wy - u * vy)


def _heading(x, y, p, q):
    """Angle of the vector p->q. Zero-length vectors get heading 0 —
    DAD treats a stationary step as direction-free."""
    dx, dy = x[q] - x[p], y[q] - y[p]
    return np.arctan2(dy, dx), np.hypot(dx, dy)


def _dad(x, y, i, a, b):
    """Direction-Aware Distance: angular difference (radians, in [0, pi])
    between the anchor segment's direction and the direction of the
    original segment starting at p_i (Long et al., PVLDB'14)."""
    j = np.minimum(i + 1, len(x) - 1)
    ha, la = _heading(x, y, a, b)
    hi, li = _heading(x, y, i, j)
    d = np.abs(ha - hi)
    d = np.where(d > np.pi, 2 * np.pi - d, d)
    # A zero-length step (dwell) or zero-length anchor carries no
    # direction information: error 0.
    return np.where((la > _EPS) & (li > _EPS), d, 0.0)


def _sad(x, y, t, i, a, b):
    """Speed-Aware Distance: |anchor segment speed − original segment
    speed at p_i| (Muckell et al., GeoInformatica'14)."""
    j = np.minimum(i + 1, len(x) - 1)
    seg_len = np.hypot(x[b] - x[a], y[b] - y[a])
    seg_dt = np.maximum(t[b] - t[a], _EPS)
    org_len = np.hypot(x[j] - x[i], y[j] - y[i])
    org_dt = np.maximum(t[j] - t[i], _EPS)
    return np.abs(seg_len / seg_dt - org_len / org_dt)


def _anchors_for(keep: np.ndarray, n: int) -> tuple[np.ndarray, np.ndarray, np.ndarray]:
    """For every point index 0..n-1, its anchor endpoints given the sorted
    kept-index array ``keep`` (must contain 0 and n-1). Returns
    (i, a, b) restricted to *dropped* points; empty if nothing dropped."""
    keep = np.asarray(keep, dtype=np.int64)
    mask = np.ones(n, dtype=bool)
    mask[keep] = False
    i = np.nonzero(mask)[0]
    if len(i) == 0:
        return i, i, i
    pos = np.searchsorted(keep, i)  # first kept index > i
    return i, keep[pos - 1], keep[pos]


def trajectory_error(
    x: np.ndarray,
    y: np.ndarray,
    t: np.ndarray,
    keep: np.ndarray,
    measure: str,
) -> float:
    """Eq. 2: max over simplified segments of max over covered points of
    the per-point error. ``keep`` is the sorted kept-index array
    (containing 0 and n-1). Zero if nothing was dropped."""
    i, a, b = _anchors_for(keep, len(x))
    if len(i) == 0:
        return 0.0
    return float(point_errors(x, y, t, i, a, b, measure).max())
