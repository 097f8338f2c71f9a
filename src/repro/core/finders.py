"""Shared machinery for the three theme-community finders (TCS/TCFA/TCFI).

A finder returns a :class:`FinderResult`: one persisted DataFrame holding
every non-empty maximal pattern truss (schema ``pid, u, v, fu, fv``) plus a
report of how much work was done (candidates generated, MPTD invocations —
the paper's headline efficiency comparison in Figures 3–4).
"""
from __future__ import annotations

import time
from dataclasses import dataclass, field
from functools import reduce
from typing import Dict, List, Optional, Set, Tuple

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.core.frequencies import patterns_df, vertex_pattern_frequencies
from repro.core.mptd import mptd_batched
from repro.core.theme_network import induce_theme_edges
from repro.metrics import truss_metrics
from repro.core.reference import Edge, pattern_items


@dataclass
class LevelStats:
    k: int
    candidates: int
    mptd_calls: int
    qualified: int


@dataclass
class FinderResult:
    method: str
    alpha: float
    truss_edges: DataFrame  # (pid, u, v, fu, fv), persisted
    wall_seconds: float
    levels: List[LevelStats] = field(default_factory=list)

    @property
    def mptd_calls(self) -> int:
        return sum(s.mptd_calls for s in self.levels)

    @property
    def candidates(self) -> int:
        return sum(s.candidates for s in self.levels)

    def metrics(self) -> Dict[str, int]:
        return truss_metrics(self.truss_edges)

    def pids(self) -> List[str]:
        return sorted(r.pid for r in self.truss_edges.select("pid").distinct().collect())

    def to_python(self) -> Dict[str, Set[Edge]]:
        """Collect the trusses to a {pid: edge set} dict (tests/case study)."""
        out: Dict[str, Set[Edge]] = {}
        for r in self.truss_edges.collect():
            out.setdefault(r.pid, set()).add((int(r.u), int(r.v)))
        return out

    def unpersist(self) -> None:
        self.truss_edges.unpersist()


def single_item_pids(transactions: DataFrame) -> List[str]:
    """Level-1 pattern ids: every item occurring in some transaction."""
    return sorted(
        str(int(r.item)) for r in transactions.select("item").distinct().collect()
    )


def evaluate_patterns(
    edges: DataFrame,
    transactions: DataFrame,
    pids: List[str],
    alpha: float,
) -> DataFrame:
    """Induce every pattern's theme network from the full graph and run the
    batched MPTD — the TCS/TCFA evaluation path.

    The result is eagerly ``localCheckpoint``-ed: level-wise finders feed
    each level's truss into the next level's plan several times (candidate
    intersection, vertex restriction, induction), so without lineage
    truncation the logical plan grows exponentially with lattice depth and
    Catalyst analysis dominates the runtime. A checkpointed leaf keeps every
    level's plan flat.
    """
    spark = edges.sparkSession
    pats = patterns_df(spark, pids)
    freqs = vertex_pattern_frequencies(transactions, pats)
    pedges = induce_theme_edges(edges, freqs)
    return mptd_batched(pedges, alpha).localCheckpoint()


def union_all(frames: List[DataFrame]) -> DataFrame:
    return reduce(DataFrame.union, frames)


def collect_pids(truss: DataFrame) -> List[str]:
    return sorted(r.pid for r in truss.select("pid").distinct().collect())


def timed() -> float:
    return time.perf_counter()
