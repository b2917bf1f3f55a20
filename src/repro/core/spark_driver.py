"""Spark distribution of RL4QDTS (DESIGN.md §3).

RL4QDTS as published is a sequential driver algorithm (one octree, one
point inserted at a time). The reproduction hint classifies it as
single-node-parallelizable *per partition*: trajectories are bucketed
by hashing ``traj_id``, and ``groupBy(...).applyInPandas`` runs the
full RL4QDTS loop per bucket with the bucket-proportional budget, the
trained DQN weights shipped to executors as serialized bytes inside
the closure. Within a bucket, simplification stays fully collective
(per-trajectory ratios vary — the paper's core advantage); across
buckets the proportional split keeps the global budget.

``train_policy_seeds_spark`` is the Spark-side of training: the paper
trains 12 databases × 5 episodes and keeps the best model; here
independently-seeded trainings fan out over the cluster via
``mapInPandas`` and the driver keeps the seed whose best episode
reached the lowest query-result difference.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.baselines.adaptations import TRAJ_SCHEMA
from repro.core.dqn import DQN
from repro.core.rl4qdts import RL4QDTSConfig, rl4qdts_simplify
from repro.core.training import train_rl4qdts


def simplify_database_rl_spark(
    traj_df: DataFrame,
    ratio: float,
    *,
    cube_policy_bytes: bytes | None,
    point_policy_bytes: bytes | None,
    config: RL4QDTSConfig | None = None,
    use_agent_cube: bool = True,
    use_agent_point: bool = True,
    n_partitions: int = 8,
) -> DataFrame:
    """Distributed RL4QDTS: simplify ``traj_df`` to ``ratio`` of its
    points, running the collective algorithm per trajectory bucket."""
    cfg = config or RL4QDTSConfig()

    def per_bucket(pdf: pd.DataFrame) -> pd.DataFrame:
        cube = DQN.from_bytes(cube_policy_bytes) if cube_policy_bytes else None
        point = DQN.from_bytes(point_policy_bytes) if point_policy_bytes else None
        bucket_seed = cfg.seed + int(pdf["bucket"].iloc[0])
        return rl4qdts_simplify(
            pdf.drop(columns=["bucket"]),
            ratio,
            cube_policy=cube,
            point_policy=point,
            config=cfg,
            use_agent_cube=use_agent_cube,
            use_agent_point=use_agent_point,
            rng=np.random.default_rng(bucket_seed),
        )

    bucketed = traj_df.withColumn(
        "bucket", F.pmod(F.hash(F.col("traj_id")), F.lit(n_partitions))
    )
    return bucketed.groupBy("bucket").applyInPandas(per_bucket, schema=TRAJ_SCHEMA)


def train_policy_seeds_spark(
    spark: SparkSession,
    databases: list[pd.DataFrame],
    *,
    seeds: list[int],
    ratio: float = 0.05,
    config: RL4QDTSConfig | None = None,
    episodes_per_db: int = 3,
    delta: int = 50,
) -> tuple[bytes, bytes, pd.DataFrame]:
    """Fan independently-seeded RL4QDTS trainings across the cluster and
    return the best (cube_bytes, point_bytes) plus a per-seed summary."""
    cfg = config or RL4QDTSConfig()
    # Ship the training databases inside the closure (they are small by
    # construction — the paper trains on 500-trajectory samples).
    db_payload = [d.copy() for d in databases]

    def per_seed(batches):
        for pdf in batches:
            for seed in pdf["seed"].tolist():
                cube, point, stats = train_rl4qdts(
                    db_payload,
                    ratio=ratio,
                    config=RL4QDTSConfig(**{**cfg.__dict__, "seed": int(seed)}),
                    episodes_per_db=episodes_per_db,
                    delta=delta,
                    seed=int(seed),
                )
                best = min(s["final_diff"] for s in stats)
                yield pd.DataFrame(
                    {
                        "seed": [int(seed)],
                        "best_final_diff": [best],
                        "cube_bytes": [cube.to_bytes()],
                        "point_bytes": [point.to_bytes()],
                    }
                )

    seed_df = spark.createDataFrame(pd.DataFrame({"seed": seeds})).repartition(len(seeds))
    out = seed_df.mapInPandas(
        per_seed,
        schema="seed long, best_final_diff double, cube_bytes binary, point_bytes binary",
    ).toPandas()
    best_row = out.loc[out["best_final_diff"].idxmin()]
    return bytes(best_row["cube_bytes"]), bytes(best_row["point_bytes"]), out.drop(
        columns=["cube_bytes", "point_bytes"]
    )
