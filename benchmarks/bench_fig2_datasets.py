"""Fig. 2 — TopL-ICDE vs ATindex online wall clock on the five graphs.

Paper shape: ours beats ATindex on every dataset (≥ 10× at paper scale).
ATindex on the DBLP/Amazon stand-ins runs on a 5% center sample — its real
time is the measured value ×20 (recorded in extra_info, paper's protocol).
"""
from __future__ import annotations

import pytest

from repro.core.baseline import atindex_query
from repro.core.topl import topl_icde
from repro.experiments.fig2 import ATINDEX_SAMPLE
from repro.experiments.runner import make_query

DATASETS = ["Uni", "Gau", "Zipf", "DBLP-like", "Amazon-like"]


@pytest.mark.parametrize("dataset", DATASETS)
def test_fig2_ours(benchmark, fig2_prepared, dataset):
    prep = fig2_prepared[dataset]
    q = make_query(qseed=0)
    result = benchmark.pedantic(
        lambda: topl_icde(prep.local, prep.index, q, prep.pre.thetas),
        rounds=3,
        iterations=1,
        warmup_rounds=1,
    )
    benchmark.extra_info["n_found"] = len(result)
    benchmark.extra_info["top_sigma"] = round(result[0].sigma, 2) if result else 0.0


@pytest.mark.parametrize("dataset", DATASETS)
def test_fig2_atindex(benchmark, fig2_prepared, dataset):
    prep = fig2_prepared[dataset]
    q = make_query(qseed=0)
    sample = ATINDEX_SAMPLE.get(dataset)
    benchmark.pedantic(
        lambda: atindex_query(prep.local, prep.vtruss, q, sample=sample),
        rounds=1,
        iterations=1,
    )
    benchmark.extra_info["center_sample"] = sample or 1.0
    benchmark.extra_info["extrapolation_factor"] = round(1.0 / (sample or 1.0), 1)
