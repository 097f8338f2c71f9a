"""Maximal Pattern Truss Detection (Algorithm 1) on Spark.

Two interchangeable implementations, cross-checked in tests:

* :func:`mptd_batched` — the production path. The input frame holds the
  theme subgraphs of *many* patterns at once (keyed by ``pid``);
  ``groupBy("pid").applyInPandas`` runs the exact queue-based peeling
  (:func:`repro.core.reference.mptd`) on each pattern's subgraph. This
  matches the paper's observation (§7.2) that maximal pattern trusses are
  small local subgraphs — parallelism comes from the number of patterns,
  and one Spark job handles a whole lattice level.

* :func:`mptd_bulk` — a pure-DataFrame bulk-synchronous peeling: each round
  recomputes cohesions with the triangle join and drops every unqualified
  edge at once, iterating to fixpoint. Order of deletion does not matter:
  C*_p(alpha) is the unique greatest fixpoint of "delete all edges with
  eco <= alpha", so synchronous rounds converge to the same set as the
  queue (property-tested against the reference). ``localCheckpoint`` cuts
  the growing lineage each round.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import DataFrame

from repro.core import reference as ref
from repro.core.theme_network import PATTERN_EDGE_SCHEMA
from repro.core.triangles import edge_cohesion

DECOMP_SCHEMA = PATTERN_EDGE_SCHEMA + ", threshold double"


def _freq_map(pdf: pd.DataFrame) -> dict:
    f = {}
    for col_v, col_f in (("u", "fu"), ("v", "fv")):
        for vid, fr in zip(pdf[col_v].to_numpy(), pdf[col_f].to_numpy()):
            f[int(vid)] = float(fr)
    return f


def _peel_group(pdf: pd.DataFrame, alpha: float) -> pd.DataFrame:
    """Exact Algorithm-1 peeling of one pattern's theme subgraph."""
    edges = {ref.canon(int(u), int(v)) for u, v in zip(pdf["u"], pdf["v"])}
    freqs = _freq_map(pdf)
    keep = ref.mptd(edges, freqs, alpha)
    if not keep:
        return pdf.iloc[0:0]
    mask = [ref.canon(int(u), int(v)) in keep for u, v in zip(pdf["u"], pdf["v"])]
    return pdf[mask]


def mptd_batched(pattern_edges: DataFrame, alpha: float) -> DataFrame:
    """Exact maximal pattern trusses for every pattern in the batch.

    Input and output schema: (pid, u, v, fu, fv); patterns whose truss is
    empty simply vanish from the output.
    """
    # groupBy(pid) ships each pattern's (small, §7.2) subgraph to one task;
    # one Spark job peels a whole lattice level of candidates.
    return pattern_edges.groupBy("pid").applyInPandas(
        lambda pdf: _peel_group(pdf, alpha)[["pid", "u", "v", "fu", "fv"]],
        schema=PATTERN_EDGE_SCHEMA,
    )


def decompose_batched(pattern_edges: DataFrame) -> DataFrame:
    """Per-edge removal thresholds of C*_p(0) for every pattern (Section 6.1).

    Output: (pid, u, v, fu, fv, threshold) — edge ∈ R_p(threshold);
    reconstruct E*_p(alpha) by ``threshold > alpha`` (Equation 1). Edges not
    in C*_p(0) are dropped; patterns with empty C*_p(0) vanish.
    """

    def decomp(pdf: pd.DataFrame) -> pd.DataFrame:
        edges = {ref.canon(int(u), int(v)) for u, v in zip(pdf["u"], pdf["v"])}
        freqs = _freq_map(pdf)
        levels = ref.decompose(edges, freqs)
        if not levels:
            return pdf.iloc[0:0].assign(threshold=pd.Series(dtype="float64"))
        thr = [
            levels.get(ref.canon(int(u), int(v)))
            for u, v in zip(pdf["u"], pdf["v"])
        ]
        out = pdf.assign(threshold=thr)
        return out[out["threshold"].notna()][
            ["pid", "u", "v", "fu", "fv", "threshold"]
        ]

    return pattern_edges.groupBy("pid").applyInPandas(decomp, schema=DECOMP_SCHEMA)


def mptd_bulk(pattern_edges: DataFrame, alpha: float, max_rounds: int = 1000) -> DataFrame:
    """Bulk-synchronous DataFrame peeling to the same fixpoint as Alg. 1.

    Each round: cohesion via the triangle join, drop all edges with
    eco <= alpha, localCheckpoint (eager) to cut lineage, stop when no edge
    was dropped.
    """
    cur = pattern_edges.select("pid", "u", "v", "fu", "fv").localCheckpoint()
    n = cur.count()
    for _ in range(max_rounds):
        if n == 0:
            break
        nxt = (
            edge_cohesion(cur)
            .filter(f"eco > {alpha!r}")
            .select("pid", "u", "v", "fu", "fv")
            .localCheckpoint()
        )
        m = nxt.count()
        cur = nxt
        if m == n:
            break
        n = m
    return cur
