"""Benchmark fixtures.

Datasets are memoised in ``repro.experiments.datasets._CACHE`` for the whole
pytest session, so each graph pays its offline phase (Algorithm 2 in Spark)
once and every benchmark measures *online* query time only — the same
protocol as the paper's wall-clock figures.
"""
from __future__ import annotations

import pytest


@pytest.fixture(scope="session")
def fig2_prepared(spark):
    from repro.experiments.datasets import figure2_datasets

    return figure2_datasets(spark, with_atindex=True)


@pytest.fixture(scope="session")
def uni_prepared(spark):
    from repro.experiments.datasets import prepare

    return prepare(spark, kind="nws", dist="uniform")
