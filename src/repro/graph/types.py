"""Graph data model for the reproduction.

A social network (paper Def. 1) is an attributed graph whose *structure* is
undirected (friend/co-author ties — used for trusses, cores, BFS radii) while
*influence* is directed: each undirected tie {u, v} carries two independent
activation probabilities ``p_uv`` and ``p_vu`` in ``[0.5, 0.6)`` (paper
Sec. VIII-A).

``SocialGraph`` holds the two canonical Spark DataFrames:

* ``vertices``: ``id: long, keywords: array<string>, bv: long`` — ``bv`` is
  the 64-bit keyword bit vector of ``keywords`` (``core.keywords.bv_of``).
* ``edges``: ``src: long, dst: long, weight: double`` — *directed*; both
  orientations of every undirected tie are present.

Helper views (undirected canonical edges, symmetric adjacency) are derived,
never stored, so the two base frames stay the single source of truth.
"""
from __future__ import annotations

from dataclasses import dataclass

from pyspark.sql import DataFrame, functions as F


@dataclass(frozen=True)
class SocialGraph:
    """The attributed, weighted social network ``G`` as Spark DataFrames."""

    vertices: DataFrame
    edges: DataFrame

    def undirected_edges(self) -> DataFrame:
        """Canonical undirected edge set: ``(u, v)`` with ``u < v``, distinct.

        This is the structural view used by triangle counting, k-truss,
        k-core, and BFS — influence weights are dropped on purpose.
        """
        return (
            self.edges.select(
                F.least("src", "dst").alias("u"),
                F.greatest("src", "dst").alias("v"),
            )
            .where(F.col("u") != F.col("v"))
            .distinct()
        )

    def adjacency(self) -> DataFrame:
        """Symmetric unweighted adjacency ``(a, b)``: both orientations."""
        und = self.undirected_edges()
        return und.select(F.col("u").alias("a"), F.col("v").alias("b")).unionByName(
            und.select(F.col("v").alias("a"), F.col("u").alias("b"))
        )

    def num_vertices(self) -> int:
        return self.vertices.count()

    def num_undirected_edges(self) -> int:
        return self.undirected_edges().count()
