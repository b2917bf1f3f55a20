"""spark-submit entrypoint — Fig. 4 budget sweep (Geolife profile).

Usage: spark-submit jobs/comparison.py
"""
from pyspark.sql import SparkSession

from repro.experiments import budget_comparison, save_table


def main(spark: SparkSession):
    table = budget_comparison(
        spark, profile="geolife", sf=0.3, ratios=(0.0025, 0.005, 0.01, 0.02), seed=0
    )
    save_table("comparison_geolife", table)
    return table


if __name__ == "__main__":
    session = SparkSession.builder.appName("repro-comparison").getOrCreate()
    main(session)
    session.stop()
