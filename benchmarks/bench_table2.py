"""Table II — ablation study for RL4QDTS (Geolife profile).

Paper (Geolife, ~1.5M points, data-distribution range queries):
  RL4QDTS                        0.733 ± 0.018   61.11 s
  w/o Agent-Cube                 0.673 ± 0.023   50.32 s
  w/o Agent-Point                0.716 ± 0.021   59.31 s
  w/o Agent-Cube and Agent-Point 0.641 ± 0.023   48.18 s

Here: geolife profile at SF=0.3 (~75k points), budget 1%, 5 runs
(paper: 50). Absolute numbers differ (scale), orderings are compared in
EXPERIMENTS.md.
"""
import pytest

from repro.experiments import save_table
from repro.experiments import table2_ablation


@pytest.mark.benchmark(group="table2")
def test_table2_ablation(benchmark):
    table = benchmark.pedantic(
        table2_ablation,
        kwargs=dict(profile="geolife", sf=0.3, ratio=0.01, n_runs=5, seed=0),
        rounds=1,
        iterations=1,
    )
    save_table("table2_ablation", table)
    assert len(table) == 4
    assert table["range_f1_mean"].between(0, 1).all()
