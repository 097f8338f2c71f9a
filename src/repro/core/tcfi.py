"""Theme Community Finder Intersection — TCFI (Section 5.3).

TCFA with the graph-intersection property (Proposition 5.3) layered on top:
for a level-k candidate p = p1 ∪ p2 (p1, p2 qualified level-(k-1) patterns),
``C*_p(α) ⊆ C*_{p1}(α) ∩ C*_{p2}(α)``, so

* candidates whose parent-truss intersection is empty are pruned without
  any MPTD run, and
* surviving candidates induce their theme network from the (small)
  intersection instead of from the whole database network, and
  frequencies are recomputed only for the intersection's vertices.

Both steps are Spark joins over the previous level's persisted truss frame;
the candidate↔parent mapping is driver metadata.
"""
from __future__ import annotations

from typing import List, Optional, Tuple

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.core.finders import (
    FinderResult,
    LevelStats,
    collect_pids,
    evaluate_patterns,
    single_item_pids,
    timed,
    union_all,
)
from repro.core.frequencies import patterns_df, vertex_pattern_frequencies
from repro.core.mptd import mptd_batched
from repro.core.theme_network import induce_from_pattern_edges, pattern_vertices
from repro.core.reference import apriori_candidate_pairs
from repro.dbnet.generator import DatabaseNetwork


def intersect_parent_trusses(
    prev_truss: DataFrame, cand_pairs: List[Tuple[str, str, str]]
) -> DataFrame:
    """(pid, u, v): edge-set intersection C*_{p1} ∩ C*_{p2} per child pid."""
    spark = prev_truss.sparkSession
    cand = spark.createDataFrame(cand_pairs, "cid string, p1 string, p2 string")
    base = prev_truss.select("pid", "u", "v")
    e1 = base.join(cand.select(F.col("p1").alias("pid"), "cid"), "pid").select("cid", "u", "v")
    e2 = base.join(cand.select(F.col("p2").alias("pid"), "cid"), "pid").select("cid", "u", "v")
    return e1.join(e2, ["cid", "u", "v"], "inner").withColumnRenamed("cid", "pid")


def evaluate_candidates_via_intersection(
    transactions: DataFrame,
    prev_truss: DataFrame,
    cand_pairs: List[Tuple[str, str, str]],
    alpha: float,
) -> Tuple[DataFrame, int]:
    """Evaluate level-k candidates inside their parent-truss intersections.

    Returns (checkpointed truss frame, #candidates with non-empty
    intersection — the number of actual MPTD invocations, the paper's
    pruning metric). Both the intersection and the level result are
    ``localCheckpoint``-ed to keep the per-level plan flat (see
    :func:`repro.core.finders.evaluate_patterns`).
    """
    spark = transactions.sparkSession
    inter = intersect_parent_trusses(prev_truss, cand_pairs).localCheckpoint()
    surviving = inter.select("pid").distinct().count()
    verts = pattern_vertices(inter)
    pats = patterns_df(spark, [c[0] for c in cand_pairs])
    freqs = vertex_pattern_frequencies(transactions, pats, restrict=verts)
    pedges = induce_from_pattern_edges(inter, freqs)
    truss = mptd_batched(pedges, alpha).localCheckpoint()
    return truss, surviving


def run_tcfi(
    net: DatabaseNetwork, alpha: float, max_len: Optional[int] = None
) -> FinderResult:
    t0 = timed()
    levels = []
    frames = []
    pids = single_item_pids(net.transactions)
    truss = evaluate_patterns(net.edges, net.transactions, pids, alpha)
    qualified = collect_pids(truss)
    levels.append(
        LevelStats(k=1, candidates=len(pids), mptd_calls=len(pids), qualified=len(qualified))
    )
    frames.append(truss)
    prev = truss
    k = 2
    while qualified and (max_len is None or k <= max_len):
        cand_pairs = apriori_candidate_pairs(qualified)
        if not cand_pairs:
            break
        truss, mptd_calls = evaluate_candidates_via_intersection(
            net.transactions, prev, cand_pairs, alpha
        )
        qualified = collect_pids(truss)
        levels.append(
            LevelStats(
                k=k,
                candidates=len(cand_pairs),
                mptd_calls=mptd_calls,
                qualified=len(qualified),
            )
        )
        frames.append(truss)
        prev = truss
        k += 1
    all_truss = union_all(frames).persist()
    return FinderResult(
        method="TCFI",
        alpha=alpha,
        truss_edges=all_truss,
        wall_seconds=timed() - t0,
        levels=levels,
    )
