"""spark-submit entrypoint — Fig. 3 skyline comparison (five query tasks).

Usage: spark-submit jobs/skyline.py [ratio]
"""
import sys

from pyspark.sql import SparkSession

from repro.experiments import save_table, skyline_comparison


def main(spark: SparkSession, ratio: float = 0.05):
    table = skyline_comparison(spark, profile="chengdu", sf=0.1, ratio=ratio, seed=0)
    save_table("skyline_chengdu", table)
    return table


if __name__ == "__main__":
    session = SparkSession.builder.appName("repro-skyline").getOrCreate()
    main(session, float(sys.argv[1]) if len(sys.argv) > 1 else 0.05)
    session.stop()
