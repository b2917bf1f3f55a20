"""Shared experiment harness for the evaluation-section reproductions.

One module drives jobs/ and benchmarks/: it fixes the benchmark
configuration (datasets, workloads, budgets — DESIGN.md §5), trains and
disk-caches the RL4QDTS policies, and evaluates a simplified database
against the original on all five query tasks using the Spark engines.

Workload scaling note (DESIGN.md §4): the paper's test queries are
2 km × 2 km boxes with 7-day windows over multi-month datasets; our
synthetic span is 7 days, so the equivalently-selective benchmark
workload is 1 km boxes with 6 h windows.
"""
from __future__ import annotations

import pickle
import time
from pathlib import Path

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession

from repro.baselines.adaptations import simplify_database_pandas
from repro.core.dqn import DQN
from repro.core.rl4qdts import RL4QDTSConfig, rl4qdts_simplify
from repro.core.training import train_rl4qdts
from repro.queries.clustering import traclus_labels
from repro.queries.knn import knn_query
from repro.queries.measures import clustering_f1, f1, mean_f1
from repro.queries.range_query import range_query_numpy, range_query_results
from repro.queries.similarity import similarity_query
from repro.synth_data import trajectory_db_pandas
from repro.workloads.distributions import range_query_workload

ARTIFACT_DIR = Path(__file__).resolve().parents[2] / ".artifacts"

#: Benchmark workload: 1 km boxes / 6 h windows (see module docstring).
BENCH_SPATIAL = 1000.0
BENCH_DURATION = 6 * 3600.0


def bench_config(distribution: str = "data", seed: int = 0) -> RL4QDTSConfig:
    return RL4QDTSConfig(
        query_spatial=BENCH_SPATIAL,
        query_duration=BENCH_DURATION,
        distribution=distribution,
        seed=seed,
    )


def trained_policies(
    profile: str = "geolife",
    *,
    distribution: str = "data",
    ratio: float = 0.01,
    episodes_per_db: int = 8,
    seed: int = 0,
    refresh: bool = False,
) -> tuple[DQN, DQN]:
    """Train (or load cached) Agent-Cube/Agent-Point policies.

    Training mirrors the paper's protocol at container scale: several
    sampled databases, a few episodes each, best snapshot selected on a
    held-out validation database (Section V-A; DESIGN.md §4)."""
    ARTIFACT_DIR.mkdir(exist_ok=True)
    key = f"rl4qdts_{profile}_{distribution}_{ratio}_{episodes_per_db}_{seed}"
    path = ARTIFACT_DIR / f"{key}.pkl"
    if path.exists() and not refresh:
        blob = pickle.loads(path.read_bytes())
        return DQN.from_bytes(blob["cube"]), DQN.from_bytes(blob["point"])
    cfg = bench_config(distribution, seed)
    train_dbs = [trajectory_db_pandas(profile=profile, sf=0.1, seed=s) for s in range(1, 7)]
    val_db = trajectory_db_pandas(profile=profile, sf=0.15, seed=42)
    cube, point, _ = train_rl4qdts(
        train_dbs,
        ratio=ratio,
        config=cfg,
        episodes_per_db=episodes_per_db,
        delta=50,
        seed=seed,
        validation_db=val_db,
    )
    path.write_bytes(pickle.dumps({"cube": cube.to_bytes(), "point": point.to_bytes()}))
    return cube, point


# -- simplifier registry -----------------------------------------------------

def simplify_with(
    db: pd.DataFrame,
    ratio: float,
    method: str,
    *,
    config: RL4QDTSConfig | None = None,
    policies: tuple[DQN, DQN] | None = None,
    run_seed: int = 0,
) -> pd.DataFrame:
    """Run one named simplifier. ``method`` is ``rl4qdts``, an RL4QDTS
    ablation (``rl4qdts_wo_cube`` / ``_wo_point`` / ``_wo_both``), or a
    baseline spec ``<algo>(<mode>,<measure>)`` like ``topdown(E,sed)``."""
    if method.startswith("rl4qdts"):
        cfg = config or bench_config()
        cube, point = policies if policies is not None else (None, None)
        kw = dict(cube_policy=cube, point_policy=point)
        if method.endswith("wo_cube"):
            kw = dict(point_policy=point, use_agent_cube=False)
        elif method.endswith("wo_point"):
            kw = dict(cube_policy=cube, use_agent_point=False)
        elif method.endswith("wo_both"):
            kw = dict(use_agent_cube=False, use_agent_point=False)
        return rl4qdts_simplify(db, ratio, config=cfg, rng=np.random.default_rng(run_seed), **kw)
    algo, rest = method.split("(", 1)
    mode, measure = rest.rstrip(")").split(",")
    return simplify_database_pandas(db, ratio, method=algo, measure=measure, mode=mode)


#: The paper's 25 baseline adaptations (Section V-A): {Top-Down,
#: Bottom-Up, RLTS+} × {E, W} × {SED, PED, DAD, SAD} + Span-Search(E, DAD).
ALL_BASELINES = [
    f"{algo}({mode},{measure})"
    for algo in ("topdown", "bottomup", "rlts")
    for mode in ("E", "W")
    for measure in ("sed", "ped", "dad", "sad")
] + ["spansearch(E,dad)"]

#: Skyline subset used in the comparison benchmarks — the paper's
#: data-distribution skyline (Fig. 3): Top-Down/Bottom-Up with PED and
#: SED in both adaptations, plus RLTS+(E,SED).
SKYLINE_BASELINES = [
    "topdown(E,ped)",
    "topdown(W,ped)",
    "bottomup(W,ped)",
    "bottomup(E,sed)",
    "topdown(E,sed)",
    "rlts(E,sed)",
]


# -- query-task evaluation ---------------------------------------------------

def evaluate_query_tasks(
    spark: SparkSession,
    db: pd.DataFrame,
    dprime: pd.DataFrame,
    *,
    boxes: np.ndarray,
    n_query_trajs: int = 5,
    knn_k: int = 3,
    seed: int = 0,
    tasks: tuple = ("range", "knn_edr", "knn_t2vec", "similarity", "clustering"),
) -> dict[str, float]:
    """F1 per query task of D' against D (ground truth), paper Eq. 3.

    Range queries run fully in Spark SQL; kNN / similarity / clustering
    use the Spark engines (``applyInPandas`` kernels). Query
    trajectories for kNN/similarity are sampled from D; their windows
    are their own (trimmed) time spans, as in the paper's windowed
    queries."""
    rng = np.random.default_rng(seed)
    out: dict[str, float] = {}
    df_o = spark.createDataFrame(db)
    df_s = spark.createDataFrame(dprime)
    if "range" in tasks:
        out["range"] = mean_f1(
            range_query_results(df_o, boxes), range_query_results(df_s, boxes)
        )
    tids = db["traj_id"].unique()
    qids = rng.choice(tids, size=min(n_query_trajs, len(tids)), replace=False)
    queries = []
    for tid in qids:
        q = db[db["traj_id"] == tid].sort_values("seq")
        t0, t1 = q["t"].min(), q["t"].max()
        span = t1 - t0
        queries.append((int(tid), q, (t0 + 0.1 * span, t1 - 0.1 * span)))
    for task, measure in (("knn_edr", "edr"), ("knn_t2vec", "t2vec")):
        if task not in tasks:
            continue
        scores = []
        for tid, q, win in queries:
            r_o = knn_query(df_o, q, k=knn_k, window=win, measure=measure, exclude=tid)
            r_s = knn_query(df_s, q, k=knn_k, window=win, measure=measure, exclude=tid)
            scores.append(f1(r_o, r_s))
        out[task] = float(np.mean(scores))
    if "similarity" in tasks:
        scores = []
        for tid, q, win in queries:
            r_o = similarity_query(df_o, q, window=win, delta=5000.0, exclude=tid)
            r_s = similarity_query(df_s, q, window=win, delta=5000.0, exclude=tid)
            scores.append(f1(r_o, r_s))
        out["similarity"] = float(np.mean(scores))
    if "clustering" in tasks:
        lab_o = traclus_labels(df_o, eps=2000.0, min_pts=3)
        lab_s = traclus_labels(df_s, eps=2000.0, min_pts=3)
        out["clustering"] = clustering_f1(lab_o, lab_s)
    return out


# -- table harnesses ---------------------------------------------------------

def table1_statistics(sf: float = 0.1) -> pd.DataFrame:
    """Table I: statistics of the four (synthetic) datasets."""
    from repro.synth_data import TRAJ_PROFILES, dataset_statistics

    rows = []
    for profile in TRAJ_PROFILES:
        db = trajectory_db_pandas(profile=profile, sf=sf, seed=0)
        st = dataset_statistics(db)
        st["dataset"] = profile
        rows.append(st)
    return pd.DataFrame(rows)[
        ["dataset", "n_trajectories", "total_points", "avg_points_per_traj",
         "avg_sampling_interval_s", "avg_segment_length_m"]
    ]


def table2_ablation(
    *,
    profile: str = "geolife",
    sf: float = 0.3,
    ratio: float = 0.01,
    n_runs: int = 5,
    seed: int = 0,
) -> pd.DataFrame:
    """Table II: range-query F1 (± std over runs) and wall time for
    RL4QDTS and its three ablations."""
    db = trajectory_db_pandas(profile=profile, sf=sf, seed=0)
    boxes = range_query_workload(
        db, n_queries=100, distribution="data",
        spatial=BENCH_SPATIAL, duration=BENCH_DURATION, seed=99,
    )
    res_o = range_query_numpy(db, boxes)
    policies = trained_policies(profile, seed=seed)
    cfg = bench_config(seed=seed)
    rows = []
    for method in ("rl4qdts", "rl4qdts_wo_cube", "rl4qdts_wo_point", "rl4qdts_wo_both"):
        scores, times = [], []
        for run in range(n_runs):
            t0 = time.perf_counter()
            dprime = simplify_with(db, ratio, method, config=cfg, policies=policies, run_seed=run)
            times.append(time.perf_counter() - t0)
            scores.append(mean_f1(res_o, range_query_numpy(dprime, boxes)))
        rows.append(
            {
                "variant": method,
                "range_f1_mean": float(np.mean(scores)),
                "range_f1_std": float(np.std(scores)),
                "time_s": float(np.mean(times)),
            }
        )
    return pd.DataFrame(rows)


def skyline_comparison(
    spark: SparkSession,
    *,
    profile: str = "chengdu",
    sf: float = 0.1,
    ratio: float = 0.05,
    methods: list[str] | None = None,
    tasks: tuple = ("range", "knn_edr", "knn_t2vec", "similarity", "clustering"),
    seed: int = 0,
) -> pd.DataFrame:
    """Fig. 3 in table form: all five query tasks for RL4QDTS and the
    baseline adaptations at one budget."""
    db = trajectory_db_pandas(profile=profile, sf=sf, seed=0)
    boxes = range_query_workload(
        db, n_queries=100, distribution="data",
        spatial=BENCH_SPATIAL, duration=BENCH_DURATION, seed=99,
    )
    policies = trained_policies(profile, ratio=ratio, seed=seed)
    cfg = bench_config(seed=seed)
    methods = methods or (["rl4qdts"] + SKYLINE_BASELINES)
    rows = []
    for method in methods:
        t0 = time.perf_counter()
        dprime = simplify_with(db, ratio, method, config=cfg, policies=policies, run_seed=seed)
        elapsed = time.perf_counter() - t0
        scores = evaluate_query_tasks(spark, db, dprime, boxes=boxes, seed=seed, tasks=tasks)
        rows.append({"method": method, "simplify_s": elapsed, **scores})
    return pd.DataFrame(rows)


def budget_comparison(
    spark: SparkSession,
    *,
    profile: str = "geolife",
    sf: float = 0.3,
    ratios: tuple = (0.0025, 0.005, 0.01, 0.02),
    methods: list[str] | None = None,
    tasks: tuple = ("range", "knn_edr"),
    seed: int = 0,
) -> pd.DataFrame:
    """Fig. 4 in table form: F1 vs storage budget for RL4QDTS vs the
    skyline baselines."""
    db = trajectory_db_pandas(profile=profile, sf=sf, seed=0)
    boxes = range_query_workload(
        db, n_queries=100, distribution="data",
        spatial=BENCH_SPATIAL, duration=BENCH_DURATION, seed=99,
    )
    policies = trained_policies(profile, seed=seed)
    cfg = bench_config(seed=seed)
    methods = methods or ["rl4qdts", "topdown(E,ped)", "bottomup(W,ped)", "bottomup(E,sed)"]
    rows = []
    for ratio in ratios:
        for method in methods:
            dprime = simplify_with(db, ratio, method, config=cfg, policies=policies, run_seed=seed)
            scores = evaluate_query_tasks(spark, db, dprime, boxes=boxes, seed=seed, tasks=tasks)
            rows.append({"ratio": ratio, "method": method, **scores})
    return pd.DataFrame(rows)


def scalability(
    spark: SparkSession,
    *,
    profile: str = "osm",
    sfs: tuple = (0.2, 0.5, 1.0),
    ratio: float = 0.01,
    methods: list[str] | None = None,
    n_partitions: int = 8,
    seed: int = 0,
) -> pd.DataFrame:
    """Fig. 8(a) in table form: wall time vs database size N for the
    Spark-distributed simplifiers."""
    from repro.baselines.adaptations import simplify_database_spark
    from repro.core.spark_driver import simplify_database_rl_spark

    policies = trained_policies("geolife", seed=seed)  # transfer, as in paper
    cube_b, point_b = policies[0].to_bytes(), policies[1].to_bytes()
    cfg = bench_config(seed=seed)
    methods = methods or ["rl4qdts", "topdown(E,sed)", "bottomup(E,sed)"]
    rows = []
    for sf in sfs:
        db = trajectory_db_pandas(profile=profile, sf=sf, seed=0)
        df = spark.createDataFrame(db).cache()
        n = df.count()
        for method in methods:
            t0 = time.perf_counter()
            if method == "rl4qdts":
                out = simplify_database_rl_spark(
                    df, ratio, cube_policy_bytes=cube_b, point_policy_bytes=point_b,
                    config=cfg, n_partitions=n_partitions,
                )
            else:
                algo, rest = method.split("(", 1)
                mode, measure = rest.rstrip(")").split(",")
                out = simplify_database_spark(
                    df, ratio, method=algo, measure=measure, mode=mode,
                    n_partitions=n_partitions,
                )
            kept = out.count()  # force execution
            rows.append({"sf": sf, "n_points": n, "method": method,
                         "kept": kept, "time_s": time.perf_counter() - t0})
        df.unpersist()
    return pd.DataFrame(rows)


def save_table(name: str, df: pd.DataFrame) -> None:
    """Persist a result table to ``.artifacts/<name>.csv`` and print it.

    pytest captures stdout, so the CSV files are the durable source of
    the "measured" columns recorded in EXPERIMENTS.md."""
    ARTIFACT_DIR.mkdir(exist_ok=True)
    df.to_csv(ARTIFACT_DIR / f"{name}.csv", index=False)
    print(f"\n== {name} ==")
    print(df.to_string(index=False))
