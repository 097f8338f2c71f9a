"""Theme-network induction (Section 3.1).

G_p is the subgraph of G induced by vertices with f_i(p) > 0. In the batched
pipeline every row carries its pattern id, so one join induces every
candidate's theme network at once. The output schema
``(pid, u, v, fu, fv)`` — an edge of G_p annotated with its endpoint
frequencies — is the working representation consumed by the cohesion /
MPTD stages.
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

PATTERN_EDGE_SCHEMA = "pid string, u long, v long, fu double, fv double"


def induce_theme_edges(edges: DataFrame, freqs: DataFrame) -> DataFrame:
    """Induce theme-network edges for every pattern from the full graph.

    ``edges``: (u, v) with u < v. ``freqs``: (pid, vid, freq) with freq > 0.
    Inner joins keep exactly the edges whose endpoints both have positive
    frequency for the pattern.
    """
    fu = freqs.select(F.col("pid"), F.col("vid").alias("u"), F.col("freq").alias("fu"))
    fv = freqs.select(F.col("pid"), F.col("vid").alias("v"), F.col("freq").alias("fv"))
    return (
        edges.join(fu, "u", "inner")
        .join(fv, ["pid", "v"], "inner")
        .select("pid", "u", "v", "fu", "fv")
    )


def induce_from_pattern_edges(pattern_edges: DataFrame, freqs: DataFrame) -> DataFrame:
    """Induce theme-network edges when the base edges already carry a pid.

    Used by TCFI / TC-Tree: ``pattern_edges`` (pid, u, v) is the intersection
    of the two parent trusses; frequencies are the child pattern's.
    """
    fu = freqs.select(F.col("pid"), F.col("vid").alias("u"), F.col("freq").alias("fu"))
    fv = freqs.select(F.col("pid"), F.col("vid").alias("v"), F.col("freq").alias("fv"))
    return (
        pattern_edges.select("pid", "u", "v")
        .join(fu, ["pid", "u"], "inner")
        .join(fv, ["pid", "v"], "inner")
        .select("pid", "u", "v", "fu", "fv")
    )


def pattern_vertices(pattern_edges: DataFrame) -> DataFrame:
    """(pid, vid): distinct vertices per pattern from a pattern-edge frame."""
    return (
        pattern_edges.select("pid", F.col("u").alias("vid"))
        .union(pattern_edges.select("pid", F.col("v").alias("vid")))
        .distinct()
    )
