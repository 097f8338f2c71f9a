"""The paper's theorems as end-to-end Spark properties on the shared
planted network (small_net): Theorem 5.1, Propositions 5.2/5.3, Theorem 6.1
— each exercised through the full frequency→induce→MPTD pipeline rather
than the reference implementation."""
from __future__ import annotations

import pytest

from repro.core import reference as ref
from repro.core.frequencies import patterns_df, vertex_pattern_frequencies
from repro.core.mptd import decompose_batched, mptd_batched
from repro.core.theme_network import induce_theme_edges


@pytest.fixture(scope="module")
def chain_trusses(spark, small_net, small_py):
    """Trusses of a pattern chain p1 ⊂ p2 ⊂ p3 (first 1, 2, 3 items)."""
    items = sorted(small_py.items)
    pids = [ref.pattern_id(items[: k + 1]) for k in range(3)]
    pats = patterns_df(spark, pids)
    freqs = vertex_pattern_frequencies(small_net.transactions, pats)
    pedges = induce_theme_edges(small_net.edges, freqs)
    out = {}
    for r in mptd_batched(pedges, 0.0).collect():
        out.setdefault(r.pid, set()).add((r.u, r.v))
    return pids, out


def test_theorem_5_1_through_spark(chain_trusses):
    pids, trusses = chain_trusses
    t = [trusses.get(p, set()) for p in pids]
    assert t[2] <= t[1] <= t[0]


def test_proposition_5_2_through_spark(chain_trusses):
    pids, trusses = chain_trusses
    # if the longer pattern is non-empty, every sub-pattern is non-empty
    if trusses.get(pids[2]):
        assert trusses.get(pids[1]) and trusses.get(pids[0])


def test_proposition_5_3_through_spark(spark, small_net, small_py):
    items = sorted(small_py.items)
    a, b = str(items[0]), str(items[1])
    ab = ref.pattern_id(items[:2])
    pats = patterns_df(spark, [a, b, ab])
    freqs = vertex_pattern_frequencies(small_net.transactions, pats)
    pedges = induce_theme_edges(small_net.edges, freqs)
    out = {}
    for r in mptd_batched(pedges, 0.0).collect():
        out.setdefault(r.pid, set()).add((r.u, r.v))
    assert out.get(ab, set()) <= (out.get(a, set()) & out.get(b, set()))


def test_theorem_6_1_through_spark(spark, small_net, small_py):
    """Decomposition of the real network's level-1 trusses reconstructs a
    direct MPTD run at every decomposition threshold."""
    items = sorted(small_py.items)
    pids = [str(i) for i in items[:3]]
    pats = patterns_df(spark, pids)
    freqs = vertex_pattern_frequencies(small_net.transactions, pats)
    pedges = induce_theme_edges(small_net.edges, freqs).localCheckpoint()
    rows = decompose_batched(pedges).collect()
    thresholds = sorted({r.threshold for r in rows})
    # Probe strictly below each threshold: cohesions are float sums that the
    # two code paths accumulate in different orders, so an exact-threshold
    # probe turns mathematical ties into 1-ulp coin flips. alpha = t - 1e-9
    # asks the same semantic question without the tie.
    probes = [0.0] + [t - 1e-9 for t in thresholds[:3]] + [thresholds[-1] + 1.0]
    for alpha in probes:
        want = {}
        for r in mptd_batched(pedges, alpha).collect():
            want.setdefault(r.pid, set()).add((r.u, r.v))
        got = {}
        for r in rows:
            if r.threshold > alpha:
                got.setdefault(r.pid, set()).add((r.u, r.v))
        assert got == want, alpha


def test_mptd_monotone_alpha_through_spark(spark, small_net, small_py):
    items = sorted(small_py.items)
    pats = patterns_df(spark, [str(items[0])])
    freqs = vertex_pattern_frequencies(small_net.transactions, pats)
    pedges = induce_theme_edges(small_net.edges, freqs).localCheckpoint()
    prev = None
    for alpha in (0.0, 0.3, 0.8, 2.0):
        cur = {(r.u, r.v) for r in mptd_batched(pedges, alpha).collect()}
        if prev is not None:
            assert cur <= prev
        prev = cur
