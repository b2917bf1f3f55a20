"""Shared test fixtures: small deterministic trajectory databases.

The session-scoped ``spark`` fixture comes from the repo-root
conftest.py; everything here is driver-side data plumbing.
"""
import numpy as np
import pandas as pd
import pytest

from repro.synth_data import trajectory_db_pandas
from repro.workloads.distributions import range_query_workload


def make_traj(n: int = 50, seed: int = 0) -> tuple[np.ndarray, np.ndarray, np.ndarray]:
    """One synthetic random-walk trajectory as (x, y, t) arrays."""
    g = np.random.default_rng(seed)
    steps = g.gamma(2.0, 15.0, n)
    ang = np.cumsum(g.normal(0, 0.4, n))
    x = np.cumsum(steps * np.cos(ang))
    y = np.cumsum(steps * np.sin(ang))
    t = np.cumsum(g.uniform(1.0, 5.0, n))
    return x, y, t


@pytest.fixture(scope="session")
def tiny_db() -> pd.DataFrame:
    """~3.5k-point chengdu-profile database (unit-test scale)."""
    return trajectory_db_pandas(profile="chengdu", sf=0.01, seed=7)


@pytest.fixture(scope="session")
def small_db() -> pd.DataFrame:
    """~12k-point geolife-profile database (integration scale)."""
    return trajectory_db_pandas(profile="geolife", sf=0.05, seed=3)


@pytest.fixture(scope="session")
def tiny_boxes(tiny_db) -> np.ndarray:
    return range_query_workload(
        tiny_db, n_queries=30, distribution="data",
        spatial=1000.0, duration=6 * 3600.0, seed=11,
    )


@pytest.fixture(scope="session")
def small_boxes(small_db) -> np.ndarray:
    return range_query_workload(
        small_db, n_queries=50, distribution="data",
        spatial=1000.0, duration=6 * 3600.0, seed=11,
    )
