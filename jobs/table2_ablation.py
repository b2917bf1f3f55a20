"""spark-submit entrypoint — Table II ablation study (Geolife profile).

Usage: spark-submit jobs/table2_ablation.py [ratio] [n_runs]
"""
import sys

from repro.experiments import save_table, table2_ablation


def main(ratio: float = 0.01, n_runs: int = 5) -> None:
    save_table(
        "table2_ablation",
        table2_ablation(profile="geolife", sf=0.3, ratio=ratio, n_runs=n_runs, seed=0),
    )


if __name__ == "__main__":
    main(
        float(sys.argv[1]) if len(sys.argv) > 1 else 0.01,
        int(sys.argv[2]) if len(sys.argv) > 2 else 5,
    )
