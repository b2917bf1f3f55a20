"""spark-submit entrypoint — Fig. 8(a) scalability (OSM profile).

Usage: spark-submit jobs/scalability.py
"""
from pyspark.sql import SparkSession

from repro.experiments import save_table, scalability


def main(spark: SparkSession):
    table = scalability(
        spark, profile="osm", sfs=(0.05, 0.1, 0.2), ratio=0.01,
        methods=["rl4qdts", "topdown(E,sed)", "bottomup(E,sed)"], seed=0,
    )
    save_table("scalability_osm", table)
    return table


if __name__ == "__main__":
    session = SparkSession.builder.appName("repro-scalability").getOrCreate()
    main(session)
    session.stop()
