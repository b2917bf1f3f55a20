"""Fig. 4 (table form) — budget sweep on the Geolife profile.

Paper: storage budget 0.25%–2% of N on Geolife; RL4QDTS's F1 climbs
from ~0.62 to ~0.95 on range queries and stays above every skyline
baseline at each budget. Here: geolife profile at SF=0.3, budgets
0.25%–2%, range + kNN(EDR) F1 for RL4QDTS vs three skyline baselines.
"""
import pytest

from repro.experiments import save_table
from repro.experiments import budget_comparison


@pytest.mark.benchmark(group="comparison")
def test_budget_sweep_geolife(benchmark, spark):
    table = benchmark.pedantic(
        budget_comparison,
        args=(spark,),
        kwargs=dict(profile="geolife", sf=0.3,
                    ratios=(0.0025, 0.005, 0.01, 0.02), seed=0),
        rounds=1,
        iterations=1,
    )
    save_table("comparison_geolife", table)
    assert set(table["ratio"]) == {0.0025, 0.005, 0.01, 0.02}
    assert table["range"].between(0, 1).all()
