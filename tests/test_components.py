"""Theme-community extraction: per-pattern union-find and DataFrame label
propagation, against the reference connected components."""
from __future__ import annotations

import numpy as np
import pytest

from repro.core import reference as ref
from repro.core.components import communities_batched, connected_components_df


def _pe_frame(spark, groups):
    rows = []
    for pid, edges in groups.items():
        for u, v in sorted(edges):
            rows.append((pid, u, v, 1.0, 1.0))
    return spark.createDataFrame(
        rows, "pid string, u long, v long, fu double, fv double"
    )


def _clique(lo, n):
    return {(lo + i, lo + j) for i in range(n) for j in range(i + 1, n)}


def test_communities_batched_two_components(spark):
    groups = {"p": _clique(0, 3) | _clique(10, 4)}
    rows = communities_batched(_pe_frame(spark, groups)).collect()
    comps = {}
    for r in rows:
        comps.setdefault((r.pid, r.community), set()).add(r.vid)
    assert comps == {("p", 0): {0, 1, 2}, ("p", 10): {10, 11, 12, 13}}


def test_communities_batched_per_pattern(spark):
    groups = {"a": _clique(0, 3), "b": _clique(0, 3) | {(2, 3)}}
    rows = communities_batched(_pe_frame(spark, groups)).collect()
    by_pid = {}
    for r in rows:
        by_pid.setdefault(r.pid, set()).add(r.vid)
    assert by_pid == {"a": {0, 1, 2}, "b": {0, 1, 2, 3}}


def test_communities_batched_matches_reference_random(spark):
    rng = np.random.default_rng(4)
    pairs = [(i, j) for i in range(12) for j in range(i + 1, 12)]
    idx = rng.choice(len(pairs), 18, replace=False)
    edges = {pairs[i] for i in idx}
    rows = communities_batched(_pe_frame(spark, {"p": edges})).collect()
    got = {}
    for r in rows:
        got.setdefault(r.community, set()).add(r.vid)
    want = {min(c): c for c in ref.connected_components(edges)}
    assert got == want


def test_connected_components_df(spark):
    edges = _clique(0, 4) | _clique(20, 3) | {(3, 5), (5, 6)}
    df = spark.createDataFrame(sorted(edges), "u long, v long")
    labels = {r.vid: r.component for r in connected_components_df(df).collect()}
    want = {min(c): c for c in ref.connected_components(edges)}
    got = {}
    for vid, comp in labels.items():
        got.setdefault(comp, set()).add(vid)
    assert got == want


def test_connected_components_df_path_graph(spark):
    """Long path exercises multiple propagation rounds."""
    edges = {(i, i + 1) for i in range(15)}
    df = spark.createDataFrame(sorted(edges), "u long, v long")
    labels = {r.component for r in connected_components_df(df).collect()}
    assert labels == {0}
