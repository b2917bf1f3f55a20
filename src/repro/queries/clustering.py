"""TRACLUS-lite trajectory clustering (Lee, Han & Whang, SIGMOD'07).

The paper's clustering query runs TRACLUS: (1) partition each
trajectory into characteristic points by approximate MDL cost
comparison, (2) cluster the resulting line segments with a DBSCAN-style
density grouping under the weighted perpendicular/parallel/angular
segment distance. We reproduce both phases (see DESIGN.md §4 for the
"lite" scoping); the evaluation's clustering F1 compares which
trajectory *pairs* co-cluster on D vs. D', which this preserves.

Spark layering: phase 1 (per-trajectory MDL partitioning) runs via
``applyInPandas``; phase 2 needs the all-pairs segment distance matrix,
so the (heavily reduced) segment set is collected to the driver and
clustered in vectorized numpy.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame

_SEG_SCHEMA = "traj_id long, sx double, sy double, ex double, ey double"
_EPS = 1e-12


# -- Phase 1: MDL partitioning into characteristic points -------------------

def _mdl_cost(x: np.ndarray, y: np.ndarray, i: int, j: int, *, partition: bool) -> float:
    """Approximate MDL cost of describing points i..j by the single
    segment (i, j) (``partition=True``) or by the original segments
    (``partition=False``), after Lee et al.'s approximate algorithm."""
    seg_len = np.hypot(x[j] - x[i], y[j] - y[i])
    if not partition:
        steps = np.hypot(np.diff(x[i:j + 1]), np.diff(y[i:j + 1]))
        return float(np.log2(steps.sum() + 1.0))
    lh = np.log2(seg_len + 1.0)
    # L(D|H): perpendicular + angular deviation of each original step
    # from the candidate segment.
    vx, vy = x[j] - x[i], y[j] - y[i]
    nrm = max(seg_len, _EPS)
    px = x[i + 1:j] - x[i]
    py = y[i + 1:j] - y[i]
    perp = np.abs(px * vy - py * vx) / nrm
    dxs = np.diff(x[i:j + 1])
    dys = np.diff(y[i:j + 1])
    step_len = np.hypot(dxs, dys)
    cosang = np.clip((dxs * vx + dys * vy) / (np.maximum(step_len, _EPS) * nrm), -1, 1)
    ang = step_len * np.sin(np.arccos(cosang))
    ldh = np.log2(perp.sum() + 1.0) + np.log2(ang.sum() + 1.0)
    return float(lh + ldh)


def characteristic_points(x: np.ndarray, y: np.ndarray) -> np.ndarray:
    """Indices of the trajectory's characteristic points (always
    includes first and last)."""
    n = len(x)
    if n <= 2:
        return np.arange(n)
    cps = [0]
    start, length = 0, 1
    while start + length < n:
        curr = start + length
        cost_par = _mdl_cost(x, y, start, curr, partition=True)
        cost_nopar = _mdl_cost(x, y, start, curr, partition=False)
        # Partition at the previous point — but only if that actually
        # advances the scan (at length == 1 the "previous point" is the
        # current start; forcing an advance avoids an infinite loop on
        # sharp turns right after a characteristic point).
        if cost_par > cost_nopar and curr - 1 > start:
            cps.append(curr - 1)
            start, length = curr - 1, 1
        else:
            length += 1
    cps.append(n - 1)
    return np.unique(np.asarray(cps, dtype=np.int64))


def extract_segments(traj_df: DataFrame) -> pd.DataFrame:
    """Characteristic segments of every trajectory (Spark phase)."""

    def per_traj(pdf: pd.DataFrame) -> pd.DataFrame:
        pdf = pdf.sort_values("seq")
        x = pdf["x"].to_numpy()
        y = pdf["y"].to_numpy()
        cp = characteristic_points(x, y)
        if len(cp) < 2:
            return pd.DataFrame(columns=["traj_id", "sx", "sy", "ex", "ey"])
        return pd.DataFrame(
            {
                "traj_id": pdf["traj_id"].iloc[0],
                "sx": x[cp[:-1]], "sy": y[cp[:-1]],
                "ex": x[cp[1:]], "ey": y[cp[1:]],
            }
        )

    return traj_df.groupBy("traj_id").applyInPandas(per_traj, schema=_SEG_SCHEMA).toPandas()


# -- Phase 2: segment DBSCAN ------------------------------------------------

def _directed_distance(s: np.ndarray, lens: np.ndarray) -> np.ndarray:
    """(n, n) matrix D where D[i, j] = Lee-et-al. distance of segment j
    measured against *base* segment i (perpendicular + parallel +
    angular components), fully vectorized via broadcasting."""
    ax = s[:, 0:1]; ay = s[:, 1:2]; bx = s[:, 2:3]; by = s[:, 3:4]  # (n,1)
    lb = np.maximum(lens[:, None], _EPS)
    ux = (bx - ax) / lb
    uy = (by - ay) / lb
    cx = s[None, :, 0]; cy = s[None, :, 1]  # others' start, (1,n)
    dx = s[None, :, 2]; dy = s[None, :, 3]  # others' end
    uc = (cx - ax) * ux + (cy - ay) * uy  # (n,n) proj of start on base i
    ud = (dx - ax) * ux + (dy - ay) * uy
    l1 = np.abs((cx - ax) * uy - (cy - ay) * ux)
    l2 = np.abs((dx - ax) * uy - (dy - ay) * ux)
    denom = l1 + l2
    d_perp = np.where(denom > _EPS, (l1 * l1 + l2 * l2) / np.where(denom > _EPS, denom, 1.0), 0.0)
    par1 = np.minimum(np.abs(uc), np.abs(uc - lb))
    par2 = np.minimum(np.abs(ud), np.abs(ud - lb))
    d_par = np.minimum(par1, par2)
    inside = ((uc >= 0) & (uc <= lb)) | ((ud >= 0) & (ud <= lb))
    d_par = np.where(inside, 0.0, d_par)
    ox = (dx - cx); oy = (dy - cy)
    lo = np.maximum(lens[None, :], _EPS)
    cosang = np.clip((ox * ux + oy * uy) / lo, -1.0, 1.0)
    d_angle = np.where(cosang >= 0, lens[None, :] * np.sqrt(1 - cosang * cosang), lens[None, :])
    return d_perp + d_par + d_angle


def segment_distance_matrix(segs: pd.DataFrame) -> np.ndarray:
    """Pairwise Lee-et-al. segment distance
    ``d_perp + d_par + d_angle`` with the longer segment as base
    (symmetric by construction)."""
    s = segs[["sx", "sy", "ex", "ey"]].to_numpy(dtype=np.float64)
    lens = np.hypot(s[:, 2] - s[:, 0], s[:, 3] - s[:, 1])
    d = _directed_distance(s, lens)
    # base = the longer of the pair: take D[i,j] when len_i >= len_j.
    base_is_row = lens[:, None] >= lens[None, :]
    return np.where(base_is_row, d, d.T)


def dbscan(dmat: np.ndarray, *, eps: float, min_pts: int) -> np.ndarray:
    """Plain DBSCAN over a precomputed distance matrix; −1 = noise."""
    n = len(dmat)
    labels = np.full(n, -1, dtype=np.int64)
    visited = np.zeros(n, dtype=bool)
    neighbors = [np.nonzero(dmat[i] <= eps)[0] for i in range(n)]
    cluster = 0
    for i in range(n):
        if visited[i]:
            continue
        visited[i] = True
        if len(neighbors[i]) < min_pts:
            continue
        labels[i] = cluster
        queue = list(neighbors[i])
        while queue:
            j = queue.pop()
            if labels[j] == -1:
                labels[j] = cluster
            if visited[j]:
                continue
            visited[j] = True
            if len(neighbors[j]) >= min_pts:
                queue.extend(neighbors[j])
        cluster += 1
    return labels


def traclus_labels(
    traj_df: DataFrame,
    *,
    eps: float = 2000.0,
    min_pts: int = 3,
    max_segments: int = 4000,
    seed: int = 0,
) -> dict[int, frozenset]:
    """traj_id → frozenset of cluster labels its segments fall in.

    ``max_segments`` bounds the O(S²) driver-side distance matrix; when
    exceeded, a seeded uniform sample of segments is clustered (logged
    in the returned mapping's coverage, not silently hidden: every
    trajectory still gets an entry, possibly empty).
    """
    segs = extract_segments(traj_df)
    all_tids = [int(t) for t in segs["traj_id"].unique()]
    if len(segs) > max_segments:
        segs = segs.sample(n=max_segments, random_state=seed).reset_index(drop=True)
    if len(segs) == 0:
        return {}
    labels = dbscan(segment_distance_matrix(segs), eps=eps, min_pts=min_pts)
    out: dict[int, set] = {t: set() for t in all_tids}
    for tid, lab in zip(segs["traj_id"].to_numpy(), labels):
        if lab != -1:
            out[int(tid)].add(int(lab))
    return {t: frozenset(s) for t, s in out.items()}
