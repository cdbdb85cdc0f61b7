"""Spark k-core peeling vs the local reference."""
from __future__ import annotations

import itertools

import pandas as pd
import pytest

from repro.graph.kcore import kcore_vertices


def df_edges(spark, pairs):
    return spark.createDataFrame(pd.DataFrame(pairs, columns=["u", "v"]))


@pytest.mark.parametrize("k", [2, 3, 4])
def test_matches_local_reference(spark, spark_graph, local_small, k):
    got = {r.id for r in kcore_vertices(spark, spark_graph.undirected_edges(), k).collect()}
    want = local_small.kcore(set(local_small.vertices()), k)
    assert got == want


def test_ring_2core(spark):
    ring = [(i, (i + 1) % 6) for i in range(6)]
    assert {r.id for r in kcore_vertices(spark, df_edges(spark, ring), 2).collect()} == set(range(6))
    assert kcore_vertices(spark, df_edges(spark, ring), 3).count() == 0


def test_k5_with_tail(spark):
    pairs = list(itertools.combinations(range(5), 2)) + [(4, 5), (5, 6)]
    got = {r.id for r in kcore_vertices(spark, df_edges(spark, pairs), 4).collect()}
    assert got == set(range(5))


def test_cascade(spark):
    # path: 2-core empty (peeling cascades from the endpoints)
    pairs = [(0, 1), (1, 2), (2, 3)]
    assert kcore_vertices(spark, df_edges(spark, pairs), 2).count() == 0
