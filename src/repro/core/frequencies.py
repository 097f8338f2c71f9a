"""Pattern-frequency computation as a Spark join/filter pipeline.

``f_i(p)`` (Section 3.1) is the proportion of vertex ``v_i``'s transactions
containing all items of pattern ``p``. Computed in bulk for a whole batch of
candidate patterns at once:

    tx(vid, tid, item) ⋈ pattern_items(pid, item)
      → groupBy(pid, vid, tid) count == |p|      (transaction contains p)
      → groupBy(pid, vid) count / n_tx(vid)      (frequency)

Only strictly-positive frequencies are emitted (exactly the vertex set of the
theme network G_p).
"""
from __future__ import annotations

from typing import Iterable, Optional

from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.core.reference import pattern_items


def patterns_df(spark: SparkSession, pids: Iterable[str]) -> DataFrame:
    """Explode canonical pattern ids into (pid, item, plen) rows."""
    rows = []
    for pid in pids:
        items = pattern_items(pid)
        for it in items:
            rows.append((pid, it, len(items)))
    if not rows:
        return spark.createDataFrame([], "pid string, item long, plen int")
    return spark.createDataFrame(rows, "pid string, item long, plen int")


def transaction_counts(transactions: DataFrame) -> DataFrame:
    """(vid, n_tx): number of transactions per vertex (multiset cardinality)."""
    return (
        transactions.select("vid", "tid")
        .distinct()
        .groupBy("vid")
        .agg(F.count("*").alias("n_tx"))
    )


def vertex_pattern_frequencies(
    transactions: DataFrame,
    patterns: DataFrame,
    restrict: Optional[DataFrame] = None,
) -> DataFrame:
    """Frequencies f_i(p) > 0 for every (pattern, vertex) pair.

    ``patterns`` is a (pid, item, plen) frame (see :func:`patterns_df`).
    ``restrict``, if given, is a (pid, vid) frame limiting which pairs are
    evaluated — TCFI/TC-Tree pass the vertices of the parent-truss
    intersection here (Proposition 5.3 guarantees no truss vertex is lost).

    Returns (pid, vid, freq) with freq in (0, 1].
    """
    tx = transactions
    if restrict is not None:
        # Evaluate only transactions of vertices that appear in some restriction,
        # then enforce the exact (pid, vid) pairs after the item join.
        tx = tx.join(restrict.select("vid").distinct(), "vid", "inner")
    hits = tx.join(patterns, "item", "inner").select("pid", "vid", "tid", "plen")
    if restrict is not None:
        hits = hits.join(restrict.select("pid", "vid").distinct(), ["pid", "vid"], "inner")
    containing = (
        hits.groupBy("pid", "vid", "tid")
        .agg(F.count("*").alias("n_hit"), F.first("plen").alias("plen"))
        .filter(F.col("n_hit") == F.col("plen"))
    )
    support = containing.groupBy("pid", "vid").agg(F.count("*").alias("n_contain"))
    return (
        support.join(transaction_counts(transactions), "vid", "inner")
        .select(
            "pid",
            "vid",
            (F.col("n_contain").cast("double") / F.col("n_tx")).alias("freq"),
        )
    )
