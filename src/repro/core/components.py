"""Theme-community extraction: maximal connected subgraphs of a maximal
pattern truss (Definition 3.5).

Two implementations: a batched per-pattern union-find (production path —
trusses are small local subgraphs, §7.2) and a pure-DataFrame label
propagation for the degenerate case of one huge truss.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.core import reference as ref

COMMUNITY_SCHEMA = "pid string, community long, vid long"


def communities_batched(pattern_edges: DataFrame) -> DataFrame:
    """(pid, community, vid): connected components of every pattern's truss.

    ``community`` is the minimum vid of the component — a deterministic
    label, so results are comparable across runs and engines.
    """

    def cc(pdf: pd.DataFrame) -> pd.DataFrame:
        edges = {ref.canon(int(u), int(v)) for u, v in zip(pdf["u"], pdf["v"])}
        comps = ref.connected_components(edges)
        pid = pdf["pid"].iloc[0]
        rows = [
            (pid, min(comp), vid) for comp in comps for vid in sorted(comp)
        ]
        return pd.DataFrame(rows, columns=["pid", "community", "vid"])

    return pattern_edges.groupBy("pid").applyInPandas(cc, schema=COMMUNITY_SCHEMA)


def connected_components_df(edges: DataFrame, max_rounds: int = 64) -> DataFrame:
    """(vid, component) by iterative min-label propagation over (u, v) edges.

    Converges in O(diameter) rounds; lineage cut with localCheckpoint."""
    labels = (
        edges.select(F.col("u").alias("vid"))
        .union(edges.select(F.col("v").alias("vid")))
        .distinct()
        .withColumn("component", F.col("vid"))
        .localCheckpoint()
    )
    sym = edges.select("u", "v").union(edges.select(F.col("v").alias("u"), F.col("u").alias("v")))
    for _ in range(max_rounds):
        neigh = (
            sym.join(labels.withColumnRenamed("vid", "v"), "v", "inner")
            .groupBy(F.col("u").alias("vid"))
            .agg(F.min("component").alias("nmin"))
        )
        updated = (
            labels.join(neigh, "vid", "left")
            .select(
                "vid",
                F.least(F.col("component"), F.coalesce("nmin", "component")).alias("component"),
            )
            .localCheckpoint()
        )
        changed = (
            updated.alias("a")
            .join(labels.alias("b"), "vid")
            .filter(F.col("a.component") != F.col("b.component"))
            .count()
        )
        labels = updated
        if changed == 0:
            break
    return labels
