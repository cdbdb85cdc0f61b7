"""Fig. 5 case study: Top1-ICDE truss community vs 4-core at the same center.

    spark-submit jobs/exp_case_study.py
"""
from __future__ import annotations

from _session import get_spark, print_rows

from repro.experiments import fig5


def main() -> None:
    spark = get_spark("exp_case_study")
    res = fig5.run(spark)
    if not res.get("found"):
        print("no Top1-ICDE community found for the default query")
    else:
        print_rows(
            "Fig 5 case study",
            [
                {"community": "TopL-ICDE (k-truss)", **res["truss"]},
                {"community": "k-core", **res["kcore"]},
            ],
        )
    spark.stop()


if __name__ == "__main__":
    main()
