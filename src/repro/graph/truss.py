"""k-truss peeling and edge trussness in the DataFrame API.

The maximal k-truss of a graph is the fixpoint of deleting every edge whose
support (triangle count) is below ``k - 2``. The ``edge trussness`` — the
largest k for which an edge survives — powers the ATindex baseline's offline
index (paper Sec. VIII-A "Competitors").
"""
from __future__ import annotations

from pyspark.sql import DataFrame, SparkSession, functions as F

from repro.graph.triangles import edge_support
from repro.sparkutil import materialize, shuffle_partitions


def ktruss_edges(
    spark: SparkSession, und_edges: DataFrame, k: int, *, partitions: int = 16
) -> DataFrame:
    """Edges of the maximal k-truss subgraph (canonical ``u < v``).

    Iterative bulk peeling: recompute support, drop edges with
    ``support < k - 2``, repeat to fixpoint. Each round is materialized to
    truncate lineage. ``k <= 2`` is a no-op (every edge is a 2-truss).
    """
    need = k - 2
    if need <= 0:
        return und_edges
    cur = materialize(und_edges)
    with shuffle_partitions(spark, partitions):
        while True:
            sup = edge_support(cur)
            n_bad = sup.where(F.col("support") < need).limit(1).count()
            if n_bad == 0:
                return cur
            cur = materialize(
                sup.where(F.col("support") >= need).select("u", "v")
            )
            if cur.limit(1).count() == 0:
                return cur


def edge_trussness(
    spark: SparkSession, und_edges: DataFrame, *, k_max: int = 20, partitions: int = 16
) -> DataFrame:
    """Trussness per edge: the maximum k such that the edge is in a k-truss.

    Peels for k = 3, 4, … reusing the surviving edge set of the previous
    level (the k-truss is contained in the (k-1)-truss); edges removed while
    peeling at level k have trussness k-1. Every edge has trussness ≥ 2.
    """
    result = und_edges.select("u", "v", F.lit(2).alias("trussness"))
    prev = und_edges
    for k in range(3, k_max + 1):
        cur = ktruss_edges(spark, prev, k, partitions=partitions)
        if cur.limit(1).count() == 0:
            break
        result = materialize(
            result.join(cur.select("u", "v", F.lit(k).alias("_t")), ["u", "v"], "left")
            .select("u", "v", F.greatest("trussness", F.coalesce("_t", F.lit(2))).alias("trussness"))
        )
        prev = cur
    return result


def vertex_trussness(trussness_df: DataFrame) -> DataFrame:
    """Vertex trussness = max trussness over incident edges (ATindex)."""
    ends = trussness_df.select(F.col("u").alias("id"), "trussness").unionByName(
        trussness_df.select(F.col("v").alias("id"), "trussness")
    )
    return ends.groupBy("id").agg(F.max("trussness").alias("trussness"))
