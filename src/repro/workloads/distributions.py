"""Range-query workload generators.

RL4QDTS trains on a synthetic workload of range queries (Section IV-A):
each query is a spatio-temporal box whose *center* follows one of the
paper's distributions:

- ``data``     — centers sampled from the database's own points (the
                 default when nothing is known about the test workload);
- ``gaussian`` — centers from N(μ, σ) over the normalized extent
                 (paper: μ=0.5, σ=0.25, varied in the transferability test);
- ``zipf``     — centers Zipf-distributed over a grid of cells with
                 exponent ``a`` (paper: a ∈ 4..8, drastic skew);
- ``real``     — centers near trajectory endpoints, mimicking
                 pickup/dropoff-anchored queries in ride-hailing
                 (the paper's Chengdu "real" workload).

Two products are derived from one distribution:

- :func:`query_centers` — a (n, 3) sample of centers. A *dense* sample
  (n ≫ the workload size) is what RL4QDTS's octree uses for its
  per-cube query counts ``Q_B`` and start-cube sampling: the algorithm
  conditions on the query *distribution*, and a 100-box workload is far
  too sparse an estimate of it (DESIGN.md §4).
- :func:`range_query_workload` — an actual (Q, 6) box workload
  (``x_min, x_max, y_min, y_max, t_min, t_max``) used for querying,
  rewards, and evaluation. The paper's test queries are 2 km × 2 km
  boxes with a 7-day window over multi-month data; our synthetic plane
  spans 7 days, so equivalently-selective defaults are smaller (set by
  callers via ``RL4QDTSConfig``).
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from repro.synth_data import TRAJ_EXTENT, TRAJ_TSPAN

DISTRIBUTIONS = ("data", "gaussian", "zipf", "real")


def query_centers(
    db: pd.DataFrame,
    *,
    n: int = 100,
    distribution: str = "data",
    mu: float = 0.5,
    sigma: float = 0.25,
    zipf_a: float = 4.0,
    zipf_cells: int = 16,
    jitter: float = 2000.0,
    seed: int = 0,
) -> np.ndarray:
    """Sample ``n`` query centers (x, y, t) from ``distribution``.

    ``jitter`` (meters) applies to the ``real`` distribution: queries
    land *near* pickup/dropoff locations, not exactly on the (always
    retained) trajectory endpoints — a zero-jitter workload would be
    answered trivially by the kept endpoints."""
    g = np.random.default_rng(seed)
    if distribution == "data":
        picks = g.integers(0, len(db), n)
        cx = db["x"].to_numpy()[picks]
        cy = db["y"].to_numpy()[picks]
        ct = db["t"].to_numpy()[picks]
    elif distribution == "gaussian":
        cx = np.clip(g.normal(mu, sigma, n), 0, 1) * TRAJ_EXTENT
        cy = np.clip(g.normal(mu, sigma, n), 0, 1) * TRAJ_EXTENT
        ct = g.uniform(0, TRAJ_TSPAN, n)
    elif distribution == "zipf":
        # Rank the zipf_cells × zipf_cells grid in a fixed seeded order
        # and sample cells with P(rank) ∝ rank^-a, uniform within a cell.
        ncell = zipf_cells * zipf_cells
        order = np.random.default_rng(12345).permutation(ncell)
        w = 1.0 / np.arange(1, ncell + 1, dtype=np.float64) ** zipf_a
        w /= w.sum()
        cells = order[g.choice(ncell, n, p=w)]
        cell_w = TRAJ_EXTENT / zipf_cells
        cx = (cells % zipf_cells + g.random(n)) * cell_w
        cy = (cells // zipf_cells + g.random(n)) * cell_w
        ct = g.uniform(0, TRAJ_TSPAN, n)
    elif distribution == "real":
        ends = db.groupby("traj_id").agg(first=("seq", "idxmin"), last=("seq", "idxmax"))
        anchor_rows = np.concatenate([ends["first"].to_numpy(), ends["last"].to_numpy()])
        picks = anchor_rows[g.integers(0, len(anchor_rows), n)]
        jit = g.normal(0, jitter, (n, 2))
        cx = db["x"].to_numpy()[picks] + jit[:, 0]
        cy = db["y"].to_numpy()[picks] + jit[:, 1]
        ct = db["t"].to_numpy()[picks]
    else:
        raise ValueError(f"unknown distribution {distribution!r}; expected {DISTRIBUTIONS}")
    return np.column_stack([cx, cy, ct])


def range_query_workload(
    db: pd.DataFrame,
    *,
    n_queries: int = 100,
    distribution: str = "data",
    spatial: float = 2000.0,
    duration: float = TRAJ_TSPAN,
    mu: float = 0.5,
    sigma: float = 0.25,
    zipf_a: float = 4.0,
    zipf_cells: int = 16,
    jitter: float = 2000.0,
    seed: int = 0,
) -> np.ndarray:
    """Generate ``n_queries`` range boxes over trajectory database ``db``."""
    c = query_centers(
        db,
        n=n_queries,
        distribution=distribution,
        mu=mu,
        sigma=sigma,
        zipf_a=zipf_a,
        zipf_cells=zipf_cells,
        jitter=jitter,
        seed=seed,
    )
    half = spatial / 2.0
    half_t = duration / 2.0
    return np.column_stack(
        [c[:, 0] - half, c[:, 0] + half, c[:, 1] - half, c[:, 1] + half,
         c[:, 2] - half_t, c[:, 2] + half_t]
    )


def workload_to_pandas(boxes: np.ndarray) -> pd.DataFrame:
    """Boxes array → DataFrame with a ``qid`` column, for Spark/DuckDB."""
    return pd.DataFrame(
        {
            "qid": np.arange(len(boxes), dtype=np.int64),
            "x_min": boxes[:, 0],
            "x_max": boxes[:, 1],
            "y_min": boxes[:, 2],
            "y_max": boxes[:, 3],
            "t_min": boxes[:, 4],
            "t_max": boxes[:, 5],
        }
    )
