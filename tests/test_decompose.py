"""Truss decomposition: Spark batched decomposition vs the reference, and
the PatternDecomposition container (the linked list L_p, Theorem 6.1)."""
from __future__ import annotations

import numpy as np
import pytest

from repro.core import reference as ref
from repro.core.decompose import PatternDecomposition
from repro.core.mptd import decompose_batched, mptd_batched


def _pe_frame(spark, groups):
    rows = []
    for pid, (edges, freqs) in groups.items():
        for u, v in sorted(edges):
            rows.append((pid, u, v, float(freqs[u]), float(freqs[v])))
    return spark.createDataFrame(
        rows, "pid string, u long, v long, fu double, fv double"
    )


def _random_groups(n_groups, seed):
    rng = np.random.default_rng(seed)
    groups = {}
    for g in range(n_groups):
        n = int(rng.integers(5, 11))
        pairs = [(i, j) for i in range(n) for j in range(i + 1, n)]
        idx = rng.choice(len(pairs), int(rng.integers(6, len(pairs) + 1)), replace=False)
        edges = {pairs[i] for i in idx}
        freqs = {i: float(rng.uniform(0.05, 1.0)) for i in range(n)}
        groups[f"g{g}"] = (edges, freqs)
    return groups


def test_decompose_batched_matches_reference(spark):
    groups = _random_groups(6, seed=21)
    rows = decompose_batched(_pe_frame(spark, groups)).collect()
    got = {}
    for r in rows:
        got.setdefault(r.pid, {})[(r.u, r.v)] = r.threshold
    for pid, (edges, freqs) in groups.items():
        want = ref.decompose(edges, freqs)
        assert got.get(pid, {}) == pytest.approx(want), pid


def test_decomposition_reconstructs_mptd(spark):
    """Eq. 1 through the whole Spark stack: filtering the decomposed edges at
    alpha equals a direct batched MPTD run at alpha."""
    groups = _random_groups(5, seed=22)
    pe = _pe_frame(spark, groups)
    rows = decompose_batched(pe).collect()
    thresholds = sorted({r.threshold for r in rows})
    probes = [0.0] + thresholds[:4] + [max(thresholds) + 1.0]
    for alpha in probes:
        want = {}
        for r in mptd_batched(pe, alpha).collect():
            want.setdefault(r.pid, set()).add((r.u, r.v))
        got = {}
        for r in rows:
            if r.threshold > alpha:
                got.setdefault(r.pid, set()).add((r.u, r.v))
        assert got == want, alpha


def test_decompose_batched_empty_pattern_vanishes(spark):
    groups = {"gone": ({(0, 1), (1, 2)}, {0: 1.0, 1: 1.0, 2: 1.0})}
    assert decompose_batched(_pe_frame(spark, groups)).count() == 0


def _toy_decomp():
    edges = {(1, 2), (1, 3), (2, 3), (1, 5), (2, 5), (3, 4), (4, 5), (3, 5)}
    freqs = {1: 0.5, 2: 0.4, 3: 0.1, 4: 0.6, 5: 0.1}
    levels = ref.decompose(edges, freqs)
    rows = [(u, v, t) for (u, v), t in levels.items()]
    return PatternDecomposition.from_rows("p", rows), levels, edges, freqs


def test_pattern_decomposition_truss_edges():
    d, levels, edges, freqs = _toy_decomp()
    for a in [0.0] + d.levels():
        assert set(d.truss_edges(a)) == ref.mptd(edges, freqs, a)


def test_pattern_decomposition_alpha_star():
    d, levels, edges, freqs = _toy_decomp()
    assert d.alpha_star == max(levels.values())
    assert ref.mptd(edges, freqs, d.alpha_star) == set()


def test_pattern_decomposition_linked_list_partition():
    """The L_p view partitions the edge set of C*_p(0) (disjoint R_p sets)."""
    d, levels, _, _ = _toy_decomp()
    ll = d.linked_list()
    assert [a for a, _ in ll] == d.levels()
    seen = set()
    for _a, es in ll:
        assert not (seen & set(es))
        seen |= set(es)
    assert seen == set(levels)


def test_pattern_decomposition_len_and_bytes():
    d, levels, _, _ = _toy_decomp()
    assert len(d) == len(levels)
    assert d.nbytes() == len(levels) * (8 + 8 + 8)


def test_pattern_decomposition_empty():
    d = PatternDecomposition.from_rows("p", [])
    assert len(d) == 0
    assert d.alpha_star == 0.0
    assert d.truss_edges(0.0) == []
    assert d.levels() == []
