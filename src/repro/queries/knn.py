"""kNN trajectory queries (Section III-B).

A kNN query takes a query trajectory and a time window and returns the
k database trajectories with the smallest dissimilarity to the query
inside the window. The dissimilarity Θ is EDR (non-learning) or
t2vec-lite (learning-style; see ``queries/t2vec.py``).

Spark layering: the window filter and the final top-k ranking run in
the DataFrame API; the per-trajectory dissimilarity kernel (an O(n·m)
DP for EDR, an embedding distance for t2vec) runs per trajectory group
via ``applyInPandas`` with the query trajectory captured in the closure
(Spark broadcasts the serialized function to executors).
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.queries.edr import edr
from repro.queries.t2vec import T2VecLite

_DIST_SCHEMA = "traj_id long, dist double"


def _window_slice(q: pd.DataFrame, window: tuple[float, float]) -> pd.DataFrame:
    ts, te = window
    return q[(q["t"] >= ts) & (q["t"] <= te)]


def knn_query(
    traj_df: DataFrame,
    query: pd.DataFrame,
    *,
    k: int = 3,
    window: tuple[float, float],
    measure: str = "edr",
    eps: float = 2000.0,
    embedder: T2VecLite | None = None,
    exclude: int | None = None,
) -> list[int]:
    """Trajectory ids of the k nearest trajectories to ``query`` within
    ``window``. Ties break on traj_id for determinism. ``exclude`` drops
    the query's own id when it comes from the database."""
    qw = _window_slice(query, window)
    qx, qy = qw["x"].to_numpy(), qw["y"].to_numpy()
    if measure == "edr":
        def dist_fn(x, y):
            return float(edr(qx, qy, x, y, eps=eps))
    elif measure == "t2vec":
        emb = embedder or T2VecLite()
        qe = emb.embed(qx, qy)

        def dist_fn(x, y):
            return float(np.linalg.norm(qe - emb.embed(x, y)))
    else:
        raise ValueError(f"unknown measure {measure!r}")

    ts, te = window

    def per_traj(pdf: pd.DataFrame) -> pd.DataFrame:
        pdf = pdf.sort_values("seq")
        return pd.DataFrame(
            {
                "traj_id": [pdf["traj_id"].iloc[0]],
                "dist": [dist_fn(pdf["x"].to_numpy(), pdf["y"].to_numpy())],
            }
        )

    df = traj_df.filter((F.col("t") >= ts) & (F.col("t") <= te))
    if exclude is not None:
        df = df.filter(F.col("traj_id") != exclude)
    ranked = (
        df.groupBy("traj_id")
        .applyInPandas(per_traj, schema=_DIST_SCHEMA)
        .orderBy(F.col("dist").asc(), F.col("traj_id").asc())
        .limit(k)
    )
    return [r.traj_id for r in ranked.collect()]


def knn_query_numpy(
    db: pd.DataFrame,
    query: pd.DataFrame,
    *,
    k: int = 3,
    window: tuple[float, float],
    measure: str = "edr",
    eps: float = 2000.0,
    embedder: T2VecLite | None = None,
    exclude: int | None = None,
) -> list[int]:
    """Driver-side reference implementation (tests compare the Spark
    path against this)."""
    qw = _window_slice(query, window)
    qx, qy = qw["x"].to_numpy(), qw["y"].to_numpy()
    emb = embedder or T2VecLite()
    qe = emb.embed(qx, qy) if measure == "t2vec" else None
    ts, te = window
    win = db[(db["t"] >= ts) & (db["t"] <= te)]
    rows = []
    for tid, g in win.groupby("traj_id"):
        if exclude is not None and tid == exclude:
            continue
        g = g.sort_values("seq")
        x, y = g["x"].to_numpy(), g["y"].to_numpy()
        if measure == "edr":
            d = float(edr(qx, qy, x, y, eps=eps))
        else:
            d = float(np.linalg.norm(qe - emb.embed(x, y)))
        rows.append((d, int(tid)))
    rows.sort()
    return [tid for _, tid in rows[:k]]
