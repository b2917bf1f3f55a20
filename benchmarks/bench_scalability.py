"""Fig. 8(a) (table form) — scalability on the OSM profile.

Paper: N from 0.2B to 1B points, fixed budget 0.25%·N; RL4QDTS runs
faster than every baseline except the Top-Down adaptations, and
Bottom-Up adaptations are the slowest. Here: osm profile at growing SF
(container scale), Spark-distributed simplifiers (`applyInPandas` per
trajectory bucket), wall time per method.
"""
import pytest

from repro.experiments import save_table
from repro.experiments import scalability


@pytest.mark.benchmark(group="scalability")
def test_scalability_osm(benchmark, spark):
    table = benchmark.pedantic(
        scalability,
        args=(spark,),
        kwargs=dict(profile="osm", sfs=(0.05, 0.1, 0.2), ratio=0.01,
                    methods=["rl4qdts", "topdown(E,sed)", "bottomup(E,sed)"],
                    seed=0),
        rounds=1,
        iterations=1,
    )
    save_table("scalability_osm", table)
    assert (table["time_s"] > 0).all()
    assert (table["kept"] > 0).all()
