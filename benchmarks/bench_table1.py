"""Table I — dataset statistics of the four (synthetic) datasets.

Paper: Geolife 17.6k trajs / 24.9M pts / 1412 pts-per-traj / 1–5 s;
T-Drive 10.4k / 17.7M / 1713 / 177 s; Chengdu 179.8k / 32.2M / 178 /
2–4 s; OSM 513.4k / 2.9B / 5675 / 53.5 s. Our generators reproduce the
per-trajectory *shape* statistics at container scale (DESIGN.md §4);
the benchmark times generation + statistics at SF=0.1.
"""
import pytest

from repro.experiments import save_table
from repro.experiments import table1_statistics


@pytest.mark.benchmark(group="table1")
def test_table1_dataset_statistics(benchmark):
    table = benchmark.pedantic(table1_statistics, kwargs=dict(sf=0.1), rounds=1, iterations=1)
    save_table("table1_statistics", table)
    assert list(table["dataset"]) == ["geolife", "tdrive", "chengdu", "osm"]
    assert (table["total_points"] > 0).all()
