"""Similarity queries (Section III-B, after Chen & Patel 2009).

A similarity query takes a query trajectory ``T_q``, a time window
``[t_s, t_e]``, and a distance threshold δ, and returns every database
trajectory whose time-synchronized position stays within δ of the query
at *every* query timestamp in the window. On a simplified trajectory,
the position at an arbitrary timestamp is the linear interpolation
along the covering simplified segment — exactly the anchor-segment
semantics of Section III-A, so this query degrades with SED-style
deformation.

Spark layering: window filter in the DataFrame API, per-trajectory
interpolation kernel via ``applyInPandas``, final filter on the boolean
column.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F

_SIM_SCHEMA = "traj_id long, ok boolean"


def _matches(
    g: pd.DataFrame, qt: np.ndarray, qx: np.ndarray, qy: np.ndarray, delta: float
) -> bool:
    """Does trajectory ``g`` stay within δ of the query at every query
    timestamp? Requires the trajectory's span to cover all of them —
    a trajectory absent from part of the window cannot match."""
    g = g.sort_values("t")
    t = g["t"].to_numpy()
    if len(t) == 0 or qt.min() < t[0] or qt.max() > t[-1]:
        return False
    ix = np.interp(qt, t, g["x"].to_numpy())
    iy = np.interp(qt, t, g["y"].to_numpy())
    return bool(np.all(np.hypot(ix - qx, iy - qy) <= delta))


def similarity_query(
    traj_df: DataFrame,
    query: pd.DataFrame,
    *,
    window: tuple[float, float],
    delta: float = 5000.0,
    exclude: int | None = None,
) -> list[int]:
    """Trajectory ids matching the similarity predicate."""
    ts, te = window
    qw = query[(query["t"] >= ts) & (query["t"] <= te)].sort_values("t")
    if len(qw) == 0:
        return []
    qt = qw["t"].to_numpy()
    qx = qw["x"].to_numpy()
    qy = qw["y"].to_numpy()

    def per_traj(pdf: pd.DataFrame) -> pd.DataFrame:
        return pd.DataFrame(
            {
                "traj_id": [pdf["traj_id"].iloc[0]],
                "ok": [_matches(pdf, qt, qx, qy, delta)],
            }
        )

    # Keep whole trajectories (coverage is judged on the full span), so
    # no time filter before the groupBy — the kernel slices itself.
    df = traj_df
    if exclude is not None:
        df = df.filter(F.col("traj_id") != exclude)
    res = (
        df.groupBy("traj_id")
        .applyInPandas(per_traj, schema=_SIM_SCHEMA)
        .filter(F.col("ok"))
        .select("traj_id")
    )
    return sorted(r.traj_id for r in res.collect())


def similarity_query_numpy(
    db: pd.DataFrame,
    query: pd.DataFrame,
    *,
    window: tuple[float, float],
    delta: float = 5000.0,
    exclude: int | None = None,
) -> list[int]:
    """Driver-side reference implementation."""
    ts, te = window
    qw = query[(query["t"] >= ts) & (query["t"] <= te)].sort_values("t")
    if len(qw) == 0:
        return []
    qt, qx, qy = (qw[c].to_numpy() for c in ("t", "x", "y"))
    out = []
    for tid, g in db.groupby("traj_id"):
        if exclude is not None and tid == exclude:
            continue
        if _matches(g, qt, qx, qy, delta):
            out.append(int(tid))
    return sorted(out)
