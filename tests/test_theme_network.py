"""Theme-network induction vs the reference implementation."""
from __future__ import annotations

import pytest

from repro.core import reference as ref
from repro.core.frequencies import patterns_df, vertex_pattern_frequencies
from repro.core.theme_network import (
    induce_from_pattern_edges,
    induce_theme_edges,
    pattern_vertices,
)


@pytest.fixture(scope="module")
def pids(small_py):
    items = sorted(small_py.items)
    return [str(items[0]), str(items[1]), ref.pattern_id(items[:2])]


@pytest.fixture(scope="module")
def induced(spark, small_net, pids):
    pats = patterns_df(spark, pids)
    freqs = vertex_pattern_frequencies(small_net.transactions, pats)
    return induce_theme_edges(small_net.edges, freqs).persist()


def test_induced_matches_reference(induced, small_py, pids):
    got = {}
    for r in induced.collect():
        got.setdefault(r.pid, set()).add((r.u, r.v))
    for pid in pids:
        f = ref.vertex_frequencies(small_py.db, ref.pattern_items(pid))
        want = ref.theme_subgraph(small_py.edges, f)
        assert got.get(pid, set()) == want, pid


def test_induced_edge_frequencies_correct(induced, small_py):
    for r in induced.collect():
        f = ref.vertex_frequencies(small_py.db, ref.pattern_items(r.pid))
        assert r.fu == pytest.approx(f[r.u])
        assert r.fv == pytest.approx(f[r.v])


def test_induced_edges_canonical(induced):
    assert induced.filter("u >= v").count() == 0


def test_theme_network_shrinks_with_pattern(induced, small_py, pids):
    """G_{p1∪p2} ⊆ G_{p1} (theme networks shrink as the pattern grows)."""
    got = {}
    for r in induced.collect():
        got.setdefault(r.pid, set()).add((r.u, r.v))
    single, pair = pids[0], pids[2]
    assert got.get(pair, set()) <= got.get(single, set())


def test_induce_from_pattern_edges_roundtrip(spark, small_net, pids):
    """Re-inducing from already-pid-keyed edges with the same frequencies is
    the identity on the edge set."""
    pats = patterns_df(spark, pids)
    freqs = vertex_pattern_frequencies(small_net.transactions, pats)
    base = induce_theme_edges(small_net.edges, freqs)
    again = induce_from_pattern_edges(base.select("pid", "u", "v"), freqs)
    a = {(r.pid, r.u, r.v, round(r.fu, 9), round(r.fv, 9)) for r in base.collect()}
    b = {(r.pid, r.u, r.v, round(r.fu, 9), round(r.fv, 9)) for r in again.collect()}
    assert a == b


def test_pattern_vertices(induced):
    got = {(r.pid, r.vid) for r in pattern_vertices(induced).collect()}
    want = set()
    for r in induced.collect():
        want.add((r.pid, r.u))
        want.add((r.pid, r.v))
    assert got == want
