"""Theme Community Scanner — the paper's baseline (Section 4.2).

TCS pre-filters the pattern space with a frequency threshold ε: the
candidate set is ``P = {p | ∃ v_i : f_i(p) > ε}``, obtained by running a
per-vertex Apriori enumeration inside ``groupBy(vid).applyInPandas``
(distributed across vertices). Every candidate's theme network is then
induced from the full graph and peeled by the batched MPTD.

TCS trades accuracy for speed: a pattern that is infrequent on every single
vertex can still form a dense truss, and such communities are silently lost
(demonstrated in the Fig.-3 reproduction).
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import DataFrame

from repro.core import reference as ref
from repro.core.finders import (
    FinderResult,
    LevelStats,
    collect_pids,
    evaluate_patterns,
    timed,
)
from repro.dbnet.generator import DatabaseNetwork


def enumerate_candidates(
    transactions: DataFrame, eps: float, max_len: int = 4
) -> DataFrame:
    """Distinct pattern ids with frequency > eps on at least one vertex.

    One Apriori run per vertex database, distributed via applyInPandas.
    """

    def mine(pdf: pd.DataFrame) -> pd.DataFrame:
        txs: dict = {}
        for tid, item in zip(pdf["tid"], pdf["item"]):
            txs.setdefault(int(tid), set()).add(int(item))
        pats = ref.frequent_patterns(
            [frozenset(t) for t in txs.values()], eps, max_len
        )
        return pd.DataFrame({"pid": sorted(pats)})

    return (
        transactions.groupBy("vid")
        .applyInPandas(mine, schema="pid string")
        .distinct()
    )


def run_tcs(
    net: DatabaseNetwork, alpha: float, eps: float, max_len: int = 4
) -> FinderResult:
    """Full TCS: ε-filtered candidate enumeration + MPTD per candidate."""
    t0 = timed()
    pids = sorted(r.pid for r in enumerate_candidates(net.transactions, eps, max_len).collect())
    truss = evaluate_patterns(net.edges, net.transactions, pids, alpha)
    qualified = collect_pids(truss)
    result = FinderResult(
        method=f"TCS(eps={eps})",
        alpha=alpha,
        truss_edges=truss,
        wall_seconds=timed() - t0,
        levels=[
            LevelStats(
                k=0, candidates=len(pids), mptd_calls=len(pids), qualified=len(qualified)
            )
        ],
    )
    return result
