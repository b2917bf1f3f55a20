"""Synthetic OLAP data at a configurable scale factor.

SF=1.0 is roughly TPC-H SF1 (~1 GB across tables). Tests use SF<=0.01;
benchmarks use SF~=0.1. Generators are deterministic in ``seed`` so the
DuckDB oracle sees identical input.
"""
import zlib

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

_N_LINEITEM_PER_SF = 6_000_000
_N_ORDERS_PER_SF = 1_500_000
_N_CUSTOMER_PER_SF = 150_000
_N_PART_PER_SF = 200_000


def _rng(seed: int) -> np.random.Generator:
    return np.random.default_rng(seed)


def lineitem(spark: SparkSession, *, sf: float = 0.01, seed: int = 0) -> DataFrame:
    n = max(1, int(_N_LINEITEM_PER_SF * sf))
    n_orders = max(1, int(_N_ORDERS_PER_SF * sf))
    n_part = max(1, int(_N_PART_PER_SF * sf))
    g = _rng(seed)
    pdf = pd.DataFrame(
        {
            "l_orderkey": g.integers(1, n_orders + 1, n),
            "l_partkey": g.integers(1, n_part + 1, n),
            "l_linenumber": g.integers(1, 8, n),
            "l_quantity": g.integers(1, 51, n).astype("float64"),
            "l_extendedprice": (g.random(n) * 90000 + 900).round(2),
            "l_discount": (g.random(n) * 0.1).round(2),
            "l_tax": (g.random(n) * 0.08).round(2),
            "l_returnflag": g.choice(list("NRA"), n),
            "l_linestatus": g.choice(list("OF"), n),
            "l_shipdate": pd.to_datetime("1992-01-01")
            + pd.to_timedelta(g.integers(0, 2557, n), unit="D"),
        }
    )
    return spark.createDataFrame(pdf)


def orders(spark: SparkSession, *, sf: float = 0.01, seed: int = 1) -> DataFrame:
    n = max(1, int(_N_ORDERS_PER_SF * sf))
    n_cust = max(1, int(_N_CUSTOMER_PER_SF * sf))
    g = _rng(seed)
    pdf = pd.DataFrame(
        {
            "o_orderkey": np.arange(1, n + 1),
            "o_custkey": g.integers(1, n_cust + 1, n),
            "o_orderstatus": g.choice(list("OFP"), n),
            "o_totalprice": (g.random(n) * 500000 + 1000).round(2),
            "o_orderdate": pd.to_datetime("1992-01-01")
            + pd.to_timedelta(g.integers(0, 2406, n), unit="D"),
            "o_orderpriority": g.choice(
                ["1-URGENT", "2-HIGH", "3-MEDIUM", "4-NOT", "5-LOW"], n
            ),
        }
    )
    return spark.createDataFrame(pdf)


def part(spark: SparkSession, *, sf: float = 0.01, seed: int = 5) -> DataFrame:
    n = max(1, int(_N_PART_PER_SF * sf))
    g = _rng(seed)
    pdf = pd.DataFrame(
        {
            "p_partkey": np.arange(1, n + 1),
            "p_type": g.choice(
                ["STANDARD", "SMALL", "MEDIUM", "LARGE", "ECONOMY", "PROMO"], n
            ),
            "p_brand": g.choice([f"Brand#{i}{j}" for i in range(1, 6) for j in range(1, 6)], n),
            "p_size": g.integers(1, 51, n),
            "p_retailprice": (900 + (np.arange(1, n + 1) % 1000) / 10.0).round(2),
        }
    )
    return spark.createDataFrame(pdf)


def customer(spark: SparkSession, *, sf: float = 0.01, seed: int = 2) -> DataFrame:
    n = max(1, int(_N_CUSTOMER_PER_SF * sf))
    g = _rng(seed)
    pdf = pd.DataFrame(
        {
            "c_custkey": np.arange(1, n + 1),
            "c_nationkey": g.integers(0, 25, n),
            "c_acctbal": (g.random(n) * 10000 - 1000).round(2),
            "c_mktsegment": g.choice(
                ["BUILDING", "AUTOMOBILE", "MACHINERY", "HOUSEHOLD", "FURNITURE"], n
            ),
        }
    )
    return spark.createDataFrame(pdf)


def zipf_keys(spark: SparkSession, *, n: int, n_keys: int, alpha: float = 1.1, seed: int = 3) -> DataFrame:
    """Skewed key column — for join-skew / cardinality-estimation papers."""
    g = _rng(seed)
    ranks = np.arange(1, n_keys + 1)
    weights = 1.0 / ranks**alpha
    weights /= weights.sum()
    keys = g.choice(ranks, size=n, p=weights)
    return spark.createDataFrame(pd.DataFrame({"k": keys, "v": g.random(n)}))


def uniform_keys(spark: SparkSession, *, n: int, n_keys: int, seed: int = 4) -> DataFrame:
    g = _rng(seed)
    return spark.createDataFrame(
        pd.DataFrame({"k": g.integers(1, n_keys + 1, n), "v": g.random(n)})
    )


# ---------------------------------------------------------------------------
# Trajectory data for the RL4QDTS reproduction (ICDE 2024).
#
# The paper evaluates on four real datasets (Geolife, T-Drive, Chengdu,
# OSM; Table I). The container is offline, so we synthesize heading-
# persistent random-walk trajectories whose *distinguishing* statistics
# (sampling interval, mean step length, points per trajectory, trajectory
# count ratios) follow Table I. See DESIGN.md §4 for the substitution
# rationale. A database is a DataFrame with columns
#   traj_id:int64, seq:int64, x:float64, y:float64, t:float64
# (x, y in meters in a city-scale plane; t in seconds).

TRAJ_PROFILES = {
    # name: (mean pts/traj, sampling interval range (s), mean step (m),
    #        dwell probability, trajectories per SF)
    "geolife": dict(mean_len=1412, dt=(1.0, 5.0), step=9.96, dwell=0.25, n_per_sf=180),
    "tdrive": dict(mean_len=1713, dt=(177.0, 177.0), step=623.0, dwell=0.10, n_per_sf=100),
    "chengdu": dict(mean_len=178, dt=(2.0, 4.0), step=25.0, dwell=0.15, n_per_sf=1800),
    "osm": dict(mean_len=5675, dt=(53.5, 53.5), step=180.0, dwell=0.05, n_per_sf=50),
}

#: Spatial extent of the synthetic city plane, meters. ~50 km square,
#: comparable to the Beijing / Chengdu metro areas the paper queries with
#: 2 km x 2 km range boxes.
TRAJ_EXTENT = 50_000.0
#: Temporal extent, seconds (7 days — the paper's range-query duration
#: window spans up to 7 days).
TRAJ_TSPAN = 7 * 24 * 3600.0


#: Number of fixed "hubs" per profile — popular places (stations, malls,
#: pickup zones) that anchor movement. Hub locations are deterministic
#: per profile (like a city's fixed geography), NOT per database seed,
#: so training and testing databases share spatial structure the way
#: samples of one real dataset do.
_N_HUBS = 12


def profile_hubs(profile: str) -> tuple[np.ndarray, np.ndarray]:
    """(hub locations (H, 2) in meters, zipf-ish popularity weights).

    Seeded with a *stable* hash — Python's ``hash()`` is salted per
    process, which would move the city's geography between runs."""
    g = _rng(zlib.crc32(f"hubs:{profile}".encode()) % (1 << 31))
    hubs = g.uniform(0.12, 0.88, (_N_HUBS, 2)) * TRAJ_EXTENT
    pop = 1.0 / np.arange(1, _N_HUBS + 1, dtype=np.float64)
    return hubs, pop / pop.sum()


def trajectory_db_pandas(
    *,
    profile: str = "geolife",
    sf: float = 0.1,
    seed: int = 0,
    min_len: int = 8,
) -> pd.DataFrame:
    """Generate a pandas trajectory database for ``profile`` at scale ``sf``.

    Movement is hub-to-hub: each trajectory starts near a popularity-
    sampled hub and repeatedly travels toward its next destination hub
    with heading noise, dwelling near hubs (the object stops — dwells
    are what make redundancy heterogeneous across trajectories, the
    property collective simplification exploits). Hub-concentrated
    density mirrors real GPS corpora (taxis, commuters), which is what
    makes query workloads spatially concentrated and query-aware
    simplification meaningful (DESIGN.md §4). Trajectory lengths,
    per-trajectory sampling intervals, and step lengths follow the
    profile (Table I statistics). Deterministic in ``seed``.
    """
    prof = TRAJ_PROFILES[profile]
    hubs, pop = profile_hubs(profile)
    g = _rng(seed)
    n_traj = max(2, int(prof["n_per_sf"] * sf))
    frames = []
    for tid in range(n_traj):
        n = max(min_len, int(g.gamma(shape=4.0, scale=prof["mean_len"] / 4.0)))
        dt = g.uniform(*prof["dt"])
        # Start times cluster around daily rush-hour peaks (08:00 and
        # 18:00 ± 1.5 h) with a 20% uniform background — real GPS corpora
        # are temporally concentrated, which is what lets a sampled query
        # workload predict future queries in the time dimension too.
        if g.random() < 0.8:
            day = g.integers(0, 7)
            peak = g.choice([8.0, 18.0]) * 3600.0
            t0 = day * 86400.0 + peak + g.normal(0, 1.5 * 3600.0)
        else:
            t0 = g.uniform(0, TRAJ_TSPAN)
        t0 = float(np.clip(t0, 0.0, max(1.0, TRAJ_TSPAN - n * dt)))
        t = t0 + np.arange(n) * dt
        steps = g.gamma(shape=2.0, scale=prof["step"] / 2.0, size=n)
        noise = g.normal(0, 0.25, n)  # heading jitter (radians)
        o = g.choice(_N_HUBS, p=pop)
        pos = hubs[o] + g.normal(0, 800.0, 2)
        dest = hubs[g.choice(_N_HUBS, p=pop)]
        x = np.empty(n)
        y = np.empty(n)
        dwell_left = 0
        # Per-trajectory dwell propensity: some objects barely stop,
        # others dwell most of the time. This heterogeneity in
        # redundancy *across* trajectories is what makes a uniform
        # compression ratio sub-optimal (the paper's Issue 1) and
        # collective simplification advantageous.
        dwell_propensity = g.uniform(0.1, 2.5) * prof["dwell"]
        p_dwell_step = dwell_propensity * 0.05  # spontaneous mid-route stop
        for i in range(n):
            x[i], y[i] = pos
            if dwell_left > 0:
                dwell_left -= 1
                pos = pos + g.normal(0, prof["step"] * 0.01, 2)
            else:
                d = dest - pos
                dist = np.hypot(d[0], d[1])
                if dist < 400.0:
                    # Arrived: dwell near the hub (duration scales with
                    # the trajectory's dwell propensity), pick a new one.
                    mean_dwell = 10.0 + 250.0 * dwell_propensity
                    dwell_left = int(g.geometric(1.0 / mean_dwell))
                    dest = hubs[g.choice(_N_HUBS, p=pop)]
                    continue
                if g.random() < p_dwell_step:
                    dwell_left = int(g.geometric(0.1))
                    continue
                heading = np.arctan2(d[1], d[0]) + noise[i]
                step = min(steps[i], dist)
                pos = pos + step * np.array([np.cos(heading), np.sin(heading)])
            pos = np.clip(pos, 0.0, TRAJ_EXTENT)
        frames.append(
            pd.DataFrame(
                {
                    "traj_id": np.int64(tid),
                    "seq": np.arange(n, dtype=np.int64),
                    "x": x,
                    "y": y,
                    "t": t,
                }
            )
        )
    return pd.concat(frames, ignore_index=True)


def trajectories(
    spark: SparkSession,
    *,
    profile: str = "geolife",
    sf: float = 0.1,
    seed: int = 0,
) -> DataFrame:
    """Spark-side trajectory database; same content as the pandas variant."""
    return spark.createDataFrame(
        trajectory_db_pandas(profile=profile, sf=sf, seed=seed)
    )


def dataset_statistics(pdf: pd.DataFrame) -> dict:
    """Table-I-style statistics for a trajectory database."""
    by = pdf.groupby("traj_id")
    lens = by.size()
    dt = by["t"].apply(lambda s: np.diff(s.to_numpy()).mean() if len(s) > 1 else 0.0)
    step = by.apply(
        lambda f: float(
            np.hypot(np.diff(f["x"].to_numpy()), np.diff(f["y"].to_numpy())).mean()
        )
        if len(f) > 1
        else 0.0,
        include_groups=False,
    )
    return {
        "n_trajectories": int(lens.shape[0]),
        "total_points": int(len(pdf)),
        "avg_points_per_traj": float(lens.mean()),
        "avg_sampling_interval_s": float(dt.mean()),
        "avg_segment_length_m": float(step.mean()),
    }
