"""Database-level adaptations of the EDTS baselines (paper Section V-A).

The paper adapts each per-trajectory baseline to a database in two
ways:

- **"E"** — simplify each trajectory separately with the proportional
  budget ``max(2, round(r · |T|))`` (uniform compression ratio, the
  paper's Issue 1);
- **"W"** — treat the database as a whole: one global priority queue
  competes insertions/drops across *all* trajectories, so trajectories
  end with different ratios (collective, but still error-driven).

Span-Search supports only "E" (the paper: "the 'W' adaptation is not
possible").

:func:`simplify_database_spark` distributes either adaptation with the
DataFrame API: trajectories are bucketed by hashing ``traj_id`` into
``n_partitions`` groups and ``applyInPandas`` runs the pandas engine per
group with the same ratio — the global budget is met because every
bucket meets it proportionally (modulo the 2-point endpoint floor).
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.baselines.bottomup import bottomup_select
from repro.baselines.rlts import get_rlts_policy, rlts_select, simplify_rlts
from repro.baselines.spansearch import simplify_spansearch
from repro.baselines.topdown import topdown_select
from repro.core.dqn import DQN

METHODS = ("topdown", "bottomup", "rlts", "spansearch")
MODES = ("E", "W")

TRAJ_SCHEMA = "traj_id long, seq long, x double, y double, t double"


def _as_trajs(db: pd.DataFrame) -> tuple[list[int], list[tuple], list[pd.DataFrame]]:
    tids, trajs, frames = [], [], []
    for tid, g in db.groupby("traj_id"):
        g = g.sort_values("seq").reset_index(drop=True)
        tids.append(int(tid))
        trajs.append((g["x"].to_numpy(), g["y"].to_numpy(), g["t"].to_numpy()))
        frames.append(g)
    return tids, trajs, frames


def _budget(n: int, ratio: float, floor: int) -> int:
    return max(floor, int(round(ratio * n)))


def simplify_database_pandas(
    db: pd.DataFrame,
    ratio: float,
    *,
    method: str = "topdown",
    measure: str = "sed",
    mode: str = "E",
    rlts_policy: DQN | None = None,
) -> pd.DataFrame:
    """Simplify a pandas trajectory database to ``ratio`` of its points."""
    if method not in METHODS:
        raise ValueError(f"unknown method {method!r}")
    if mode not in MODES:
        raise ValueError(f"unknown mode {mode!r}")
    if method == "spansearch" and (mode != "E" or measure != "dad"):
        raise ValueError("spansearch supports mode='E' with measure='dad' only")
    tids, trajs, frames = _as_trajs(db)
    if mode == "E":
        keeps = []
        for (x, y, t) in trajs:
            w = _budget(len(x), ratio, 2)
            if method == "topdown":
                keeps.append(topdown_select([(x, y, t)], w, measure)[0])
            elif method == "bottomup":
                keeps.append(bottomup_select([(x, y, t)], w, measure)[0])
            elif method == "rlts":
                keeps.append(simplify_rlts(x, y, t, w, measure, policy=rlts_policy))
            else:
                keeps.append(simplify_spansearch(x, y, t, w))
    else:
        total = sum(len(tr[0]) for tr in trajs)
        w = _budget(total, ratio, 2 * len(trajs))
        if method == "topdown":
            keeps = topdown_select(trajs, w, measure)
        elif method == "bottomup":
            keeps = bottomup_select(trajs, w, measure)
        else:
            pol = rlts_policy or get_rlts_policy(measure)
            keeps = rlts_select(trajs, w, measure, pol)
    out = [f.iloc[k] for f, k in zip(frames, keeps)]
    return pd.concat(out, ignore_index=True)[["traj_id", "seq", "x", "y", "t"]]


def simplify_database_spark(
    traj_df: DataFrame,
    ratio: float,
    *,
    method: str = "topdown",
    measure: str = "sed",
    mode: str = "E",
    n_partitions: int = 8,
) -> DataFrame:
    """Distributed version: bucket trajectories, simplify per bucket."""
    policy_bytes = None
    if method == "rlts":
        # Train once on the driver; ship weights inside the closure.
        policy_bytes = get_rlts_policy(measure).to_bytes()

    def per_bucket(pdf: pd.DataFrame) -> pd.DataFrame:
        pol = DQN.from_bytes(policy_bytes) if policy_bytes is not None else None
        return simplify_database_pandas(
            pdf.drop(columns=["bucket"]),
            ratio,
            method=method,
            measure=measure,
            mode=mode,
            rlts_policy=pol,
        )

    bucketed = traj_df.withColumn(
        "bucket", F.pmod(F.hash(F.col("traj_id")), F.lit(n_partitions))
    )
    return bucketed.groupBy("bucket").applyInPandas(per_bucket, schema=TRAJ_SCHEMA)
