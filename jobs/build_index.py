"""Offline phase entrypoint: generate a graph, run Algorithm 2, build the
tree index, and report offline timings + index shape.

    spark-submit jobs/build_index.py [--kind nws] [--n 2000] [--dist uniform]
"""
from __future__ import annotations

import argparse

from _session import get_spark, print_rows

from repro.experiments.datasets import prepare


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--kind", default="nws", choices=["nws", "dblp", "amazon"])
    ap.add_argument("--n", type=int, default=2000)
    ap.add_argument("--dist", default="uniform", choices=["uniform", "gaussian", "zipf"])
    args = ap.parse_args()
    spark = get_spark("build_index")
    prep = prepare(spark, kind=args.kind, n=args.n, dist=args.dist, cache=False)
    print_rows(
        "offline phase",
        {
            "kind": args.kind,
            "num_vertices": prep.n_vertices,
            "num_edges": prep.n_edges,
            "index_height": prep.index.height(),
            "index_size": prep.index.size,
            **{f"sec_{k}": round(v, 2) for k, v in prep.timings.items()},
        },
    )
    spark.stop()


if __name__ == "__main__":
    main()
