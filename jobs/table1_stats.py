"""spark-submit entrypoint — Table I dataset statistics.

Usage: spark-submit jobs/table1_stats.py [sf]
"""
import sys

from repro.experiments import save_table, table1_statistics


def main(sf: float = 0.1) -> None:
    save_table("table1_statistics", table1_statistics(sf=sf))


if __name__ == "__main__":
    main(float(sys.argv[1]) if len(sys.argv) > 1 else 0.1)
