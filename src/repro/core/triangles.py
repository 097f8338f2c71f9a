"""Triangle enumeration and edge cohesion (Definition 3.1) in Spark SQL.

Edges are canonical (u < v); a triangle a < b < c is therefore the join of
three canonical edges (a,b), (b,c), (a,c), enumerated exactly once by the
standard two-step self-join. Every triangle contributes
``min(f_a, f_b, f_c)`` to each of its three edges; summing per edge yields
the cohesion. All joins are keyed by ``pid`` so an entire batch of patterns
is processed in one shot.
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F


def triangles(pattern_edges: DataFrame) -> DataFrame:
    """(pid, a, b, c, minf): all triangles per pattern with their min endpoint
    frequency. ``pattern_edges`` is (pid, u, v, fu, fv) with u < v."""
    e1 = pattern_edges.select(
        "pid",
        F.col("u").alias("a"),
        F.col("v").alias("b"),
        F.col("fu").alias("fa"),
        F.col("fv").alias("fb"),
    )
    e2 = pattern_edges.select(
        "pid", F.col("u").alias("b"), F.col("v").alias("c"), F.col("fv").alias("fc")
    )
    e3 = pattern_edges.select("pid", F.col("u").alias("a"), F.col("v").alias("c"))
    wedge = e1.join(e2, ["pid", "b"], "inner")
    tri = wedge.join(e3, ["pid", "a", "c"], "inner")
    return tri.select(
        "pid", "a", "b", "c", F.least("fa", "fb", "fc").alias("minf")
    )


def edge_cohesion(pattern_edges: DataFrame) -> DataFrame:
    """Annotate pattern edges with their cohesion: (pid, u, v, fu, fv, eco).

    Edges in no triangle get eco = 0.0 (they are always unqualified for any
    alpha >= 0, as in the paper).
    """
    tri = triangles(pattern_edges)
    contrib = (
        tri.select("pid", F.col("a").alias("u"), F.col("b").alias("v"), "minf")
        .union(tri.select("pid", F.col("b").alias("u"), F.col("c").alias("v"), "minf"))
        .union(tri.select("pid", F.col("a").alias("u"), F.col("c").alias("v"), "minf"))
    )
    eco = contrib.groupBy("pid", "u", "v").agg(F.sum("minf").alias("eco"))
    return pattern_edges.join(eco, ["pid", "u", "v"], "left").withColumn(
        "eco", F.coalesce(F.col("eco"), F.lit(0.0))
    )
