"""Fig. 3 (table form) — skyline comparison over five query tasks.

Paper: at a fixed budget, the 25 baseline adaptations are compared on
range / kNN(EDR) / kNN(t2vec) / similarity / clustering F1 and the
per-task skylines are selected; RL4QDTS then beats the skylines on
every task (by up to 35–41%). Here: chengdu profile (short
trajectories, like the paper's Chengdu run with budgets 2–20%) at
SF=0.1 with budget 3% (low end of the paper's Chengdu range, where the
methods separate), RL4QDTS + the 6 data-distribution skyline
baselines, all five query tasks via the Spark engines.
"""
import pytest

from repro.experiments import save_table
from repro.experiments import skyline_comparison


@pytest.mark.benchmark(group="skyline")
def test_skyline_five_query_tasks(benchmark, spark):
    table = benchmark.pedantic(
        skyline_comparison,
        args=(spark,),
        kwargs=dict(profile="chengdu", sf=0.1, ratio=0.03, seed=0),
        rounds=1,
        iterations=1,
    )
    save_table("skyline_chengdu", table)
    assert {"range", "knn_edr", "knn_t2vec", "similarity", "clustering"} <= set(table.columns)
    assert "rl4qdts" in set(table["method"])
