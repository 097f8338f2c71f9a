"""Theme Community Finder Apriori — TCFA (Algorithms 2 + 3).

Exact level-wise search: level 1 evaluates every single-item pattern;
level k evaluates the Apriori join of the level-(k-1) *qualified* patterns
(those with a non-empty maximal pattern truss — pattern anti-monotonicity,
Proposition 5.2, makes this pruning safe). Every candidate's theme network
is induced from the full database network, which is TCFA's bottleneck and
exactly what TCFI improves on.
"""
from __future__ import annotations

from typing import Optional

from repro.core.finders import (
    FinderResult,
    LevelStats,
    collect_pids,
    evaluate_patterns,
    single_item_pids,
    timed,
    union_all,
)
from repro.core.reference import apriori_candidates
from repro.dbnet.generator import DatabaseNetwork


def run_tcfa(
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
    k = 2
    while qualified and (max_len is None or k <= max_len):
        cands = apriori_candidates(qualified)
        if not cands:
            break
        truss = evaluate_patterns(net.edges, net.transactions, cands, alpha)
        qualified = collect_pids(truss)
        levels.append(
            LevelStats(
                k=k, candidates=len(cands), mptd_calls=len(cands), qualified=len(qualified)
            )
        )
        frames.append(truss)
        k += 1
    # Per-level frames are localCheckpoint-ed leaves; the union over them is
    # cheap and cached for the repeated reads (metrics, pids, collect).
    all_truss = union_all(frames).persist()
    return FinderResult(
        method="TCFA",
        alpha=alpha,
        truss_edges=all_truss,
        wall_seconds=timed() - t0,
        levels=levels,
    )
