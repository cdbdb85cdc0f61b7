"""Fig. 2 — TopL-ICDE vs ATindex wall clock on the five evaluation graphs.

Paper shape to reproduce: our index-based approach beats ATindex on every
dataset, "by more than one order of magnitude" at their scales (|V| = 50K /
317K / 335K); ATindex on DBLP is estimated from a 0.5% center sample ×200.
Here the stand-in "real" graphs use a 5% sample ×20 (DESIGN.md §4).
"""
from __future__ import annotations

from typing import Dict, List

from pyspark.sql import SparkSession

from repro.experiments.datasets import figure2_datasets
from repro.experiments.runner import summarize, timed_atindex, timed_topl

#: center-sampling fraction for ATindex on the larger stand-ins (paper: 0.005)
ATINDEX_SAMPLE = {"DBLP-like": 0.05, "Amazon-like": 0.05}


def run(spark: SparkSession) -> List[Dict]:
    """One row per dataset: ours vs ATindex online seconds."""
    rows: List[Dict] = []
    for label, prep in figure2_datasets(spark, with_atindex=True).items():
        t_ours, ans = timed_topl(prep)
        sample = ATINDEX_SAMPLE.get(label)
        t_at, _ = timed_atindex(prep, sample=sample)
        rows.append(
            {
                "dataset": label,
                "num_vertices": prep.n_vertices,
                "num_edges": prep.n_edges,
                "ours_sec": round(t_ours, 4),
                "atindex_sec": round(t_at, 4),
                "atindex_sampled": sample is not None,
                "speedup": round(t_at / t_ours, 2) if t_ours > 0 else float("inf"),
                **summarize(ans),
            }
        )
    return rows
