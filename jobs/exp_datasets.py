"""Table II: statistics of the evaluation graphs (stand-ins — DESIGN.md §4).

    spark-submit jobs/exp_datasets.py
"""
from __future__ import annotations

from _session import get_spark, print_rows

from repro.experiments.datasets import table2_stats


def main() -> None:
    spark = get_spark("exp_datasets")
    print_rows("Table II (stand-ins)", table2_stats(spark))
    spark.stop()


if __name__ == "__main__":
    main()
