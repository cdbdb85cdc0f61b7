"""k-core peeling in the DataFrame API (case-study baseline, paper Fig. 5)."""
from __future__ import annotations

from pyspark.sql import DataFrame, SparkSession, functions as F

from repro.graph.triangles import symmetric_adjacency
from repro.sparkutil import materialize, shuffle_partitions


def kcore_vertices(
    spark: SparkSession, und_edges: DataFrame, k: int, *, partitions: int = 16
) -> DataFrame:
    """Vertices of the maximal k-core: iteratively drop degree-<k vertices.

    Returns a single-column ``id`` DataFrame. Bulk peeling: each round
    recomputes degrees over surviving edges and filters; materialized per
    round to truncate lineage.
    """
    cur = materialize(und_edges)
    with shuffle_partitions(spark, partitions):
        while True:
            deg = (
                symmetric_adjacency(cur)
                .groupBy(F.col("a").alias("id"))
                .agg(F.count("*").alias("deg"))
            )
            bad = deg.where(F.col("deg") < k)
            if bad.limit(1).count() == 0:
                return deg.select("id")
            alive = deg.where(F.col("deg") >= k).select("id")
            cur = materialize(
                cur.join(alive.withColumnRenamed("id", "u"), "u")
                .join(alive.withColumnRenamed("id", "v"), "v")
                .select("u", "v")
            )
            if cur.limit(1).count() == 0:
                return spark.createDataFrame([], "id long")
