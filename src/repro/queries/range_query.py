"""Spatio-temporal range queries over a trajectory database.

A range query (Section III-B) returns every trajectory with at least one
point inside the box. Two implementations:

- :func:`range_query` — Spark DataFrame API: the workload is joined to
  the point table with between-predicates and the distinct (qid,
  traj_id) pairs are returned. This is the at-scale path and is
  oracle-checked against DuckDB in the tests.
- :func:`range_query_numpy` — vectorized numpy over a pandas database,
  used on the driver for RL training rewards where queries run every Δ
  insertions and Spark job latency would dominate.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.workloads.distributions import workload_to_pandas


def range_query(traj_df: DataFrame, boxes: np.ndarray) -> DataFrame:
    """All (qid, traj_id) pairs where the trajectory has a point in the
    query box. ``boxes`` is the (Q, 6) workload array."""
    spark = traj_df.sparkSession
    w = spark.createDataFrame(workload_to_pandas(boxes))
    cond = (
        (traj_df.x >= w.x_min) & (traj_df.x <= w.x_max)
        & (traj_df.y >= w.y_min) & (traj_df.y <= w.y_max)
        & (traj_df.t >= w.t_min) & (traj_df.t <= w.t_max)
    )
    return (
        traj_df.join(w, cond)
        .select(F.col("qid"), F.col("traj_id"))
        .distinct()
    )


def range_query_results(traj_df: DataFrame, boxes: np.ndarray) -> dict[int, frozenset]:
    """Collect :func:`range_query` into {qid: frozenset(traj_id)} with an
    entry for every query (empty result sets included)."""
    rows = range_query(traj_df, boxes).collect()
    out: dict[int, set] = {q: set() for q in range(len(boxes))}
    for r in rows:
        out[r.qid].add(r.traj_id)
    return {q: frozenset(s) for q, s in out.items()}


def range_query_numpy(db: pd.DataFrame, boxes: np.ndarray) -> dict[int, frozenset]:
    """Driver-side equivalent of :func:`range_query_results`."""
    x = db["x"].to_numpy()
    y = db["y"].to_numpy()
    t = db["t"].to_numpy()
    tid = db["traj_id"].to_numpy()
    out: dict[int, frozenset] = {}
    for q, b in enumerate(np.asarray(boxes, dtype=np.float64)):
        hit = (
            (x >= b[0]) & (x <= b[1])
            & (y >= b[2]) & (y <= b[3])
            & (t >= b[4]) & (t <= b[5])
        )
        out[q] = frozenset(np.unique(tid[hit]).tolist())
    return out
