"""Tests for the pure-Python reference implementation (the oracle itself).

Covers Definition 3.1 (edge cohesion), Algorithm 1 (MPTD), the k-truss
degeneration, the paper's Figure-1/Example-3.2 toy network, the theorems
(5.1 anti-monotonicity, Prop. 5.2/5.3, 6.1 decomposition) as executable
properties via hypothesis, and the Apriori helpers.
"""
from __future__ import annotations

import math
from itertools import combinations

import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core import reference as ref


# ---------------------------------------------------------------- fixtures


def clique(n):
    return {ref.canon(i, j) for i in range(n) for j in range(i + 1, n)}


def toy_figure1():
    """A 5-vertex community shaped like Figure 1(b)'s bold subgraph:
    v1..v5 with edges forming triangles 123, 125, 345... Example 3.2 says
    e12 is in triangles 123 and 125 and eco_12 = 0.2 with the pattern
    frequencies below (min over each triangle = 0.1)."""
    edges = {
        (1, 2), (1, 3), (2, 3), (1, 5), (2, 5), (3, 4), (4, 5), (3, 5),
    }
    freqs = {1: 0.5, 2: 0.4, 3: 0.1, 4: 0.6, 5: 0.1}
    return edges, freqs


# ---------------------------------------------------------------- pattern ids


def test_pattern_id_sorts_and_dedupes():
    assert ref.pattern_id([3, 1, 2, 3]) == "1|2|3"


def test_pattern_items_roundtrip():
    assert ref.pattern_items(ref.pattern_id([9, 4])) == (4, 9)


def test_pattern_items_empty():
    assert ref.pattern_items("") == ()


def test_canon():
    assert ref.canon(5, 2) == (2, 5)
    assert ref.canon(2, 5) == (2, 5)


# ---------------------------------------------------------------- frequencies


def test_vertex_frequencies_multiset_semantics():
    db = {
        0: [frozenset({1, 2}), frozenset({1, 2}), frozenset({3})],
        1: [frozenset({1})],
        2: [],
    }
    f = ref.vertex_frequencies(db, [1, 2])
    assert f == {0: pytest.approx(2 / 3)}


def test_vertex_frequencies_single_item():
    db = {0: [frozenset({1}), frozenset({2})]}
    assert ref.vertex_frequencies(db, [1]) == {0: 0.5}


def test_vertex_frequencies_excludes_zero():
    db = {0: [frozenset({1})], 1: [frozenset({2})]}
    assert 1 not in ref.vertex_frequencies(db, [1])


def test_theme_subgraph_requires_both_endpoints():
    edges = {(0, 1), (1, 2)}
    freqs = {0: 0.5, 1: 0.5}
    assert ref.theme_subgraph(edges, freqs) == {(0, 1)}


# ---------------------------------------------------------------- cohesion


def test_edge_cohesion_example_3_2():
    edges, freqs = toy_figure1()
    eco = ref.edge_cohesions(edges, freqs)
    # e12 is in triangles 123 and 125: min(.5,.4,.1) + min(.5,.4,.1) = 0.2
    assert eco[(1, 2)] == pytest.approx(0.2)


def test_edge_cohesion_no_triangle_is_zero():
    eco = ref.edge_cohesions({(0, 1), (1, 2)}, {0: 1.0, 1: 1.0, 2: 1.0})
    assert eco[(0, 1)] == 0.0 and eco[(1, 2)] == 0.0


def test_edge_cohesion_unit_freqs_counts_triangles():
    """With all f_i = 1, eco equals the triangle count (Cohen's k-truss)."""
    edges = clique(5)
    eco = ref.edge_cohesions(edges, {i: 1.0 for i in range(5)})
    assert all(c == 3.0 for c in eco.values())  # each K5 edge in 3 triangles


# ---------------------------------------------------------------- MPTD


def test_mptd_keeps_strong_clique():
    edges = clique(4)
    freqs = {i: 0.5 for i in range(4)}
    # each edge in 2 triangles, eco = 1.0 > 0.9
    assert ref.mptd(edges, freqs, 0.9) == edges


def test_mptd_removes_all_above_threshold():
    edges = clique(4)
    freqs = {i: 0.5 for i in range(4)}
    assert ref.mptd(edges, freqs, 1.0) == set()


def test_mptd_cascading_removal():
    """A triangle hanging off a clique by one edge collapses once its
    supporting edge goes."""
    edges = clique(4) | {(3, 4), (3, 5), (4, 5)}
    freqs = {i: 1.0 for i in range(6)}
    # (4,5),(3,4),(3,5) each in exactly 1 triangle (eco=1); clique edges in >=2
    out = ref.mptd(edges, freqs, 1.0)
    assert out == clique(4)


def test_mptd_alpha_zero_drops_triangle_free_edges():
    edges = {(0, 1), (1, 2), (2, 3)}
    freqs = {i: 1.0 for i in range(4)}
    assert ref.mptd(edges, freqs, 0.0) == set()


def test_mptd_is_k_truss_when_freqs_are_one():
    """Pattern truss with f=1 and alpha=k-3 is the k-truss (Section 3.2)."""
    # K5 plus a pendant triangle: 4-truss (alpha=1) keeps exactly K5
    edges = clique(5) | {(4, 5), (4, 6), (5, 6)}
    freqs = {i: 1.0 for i in range(7)}
    assert ref.mptd(edges, freqs, 4 - 3) == clique(5)


def test_mptd_disconnected_truss():
    """A maximal pattern truss need not be connected (Section 3.2)."""
    c1 = clique(4)
    c2 = {ref.canon(u + 10, v + 10) for u, v in clique(4)}
    freqs = {i: 1.0 for i in list(range(4)) + list(range(10, 14))}
    out = ref.mptd(c1 | c2 | {(3, 10)}, freqs, 0.5)
    assert out == c1 | c2


# ---------------------------------------------------------------- decomposition


def test_decompose_thresholds_positive():
    edges, freqs = toy_figure1()
    levels = ref.decompose(edges, freqs)
    assert levels and all(a > 0 for a in levels.values())


def test_decompose_covers_c0_exactly():
    edges, freqs = toy_figure1()
    c0 = ref.mptd(edges, freqs, 0.0)
    assert set(ref.decompose(edges, freqs)) == c0


def test_equation_1_reconstruction_matches_mptd():
    """Eq. 1: filtering the decomposition at alpha reproduces MPTD(alpha)."""
    edges, freqs = toy_figure1()
    levels = ref.decompose(edges, freqs)
    grid = sorted(set(levels.values()))
    probes = [0.0] + grid + [g - 1e-9 for g in grid] + [max(grid) + 1.0]
    for a in probes:
        assert ref.truss_at(levels, a) == ref.mptd(edges, freqs, a), a


def test_decompose_clique_single_level():
    edges = clique(4)
    freqs = {i: 0.5 for i in range(4)}
    levels = ref.decompose(edges, freqs)
    assert set(levels.values()) == {1.0}


def test_theorem_6_1_strict_shrink():
    """alpha2 >= beta (min cohesion) implies strictly smaller truss."""
    edges, freqs = toy_figure1()
    c1 = ref.mptd(edges, freqs, 0.0)
    eco = ref.edge_cohesions(c1, freqs)
    beta = min(eco.values())
    c2 = ref.mptd(edges, freqs, beta)
    assert c2 < c1


# ---------------------------------------------------------------- components


def test_connected_components_two_cliques():
    c1 = clique(3)
    c2 = {ref.canon(u + 10, v + 10) for u, v in clique(3)}
    comps = sorted(map(sorted, ref.connected_components(c1 | c2)))
    assert comps == [[0, 1, 2], [10, 11, 12]]


def test_connected_components_empty():
    assert ref.connected_components(set()) == []


# ---------------------------------------------------------------- apriori


def test_frequent_patterns_strict_threshold():
    txs = [frozenset({1, 2}), frozenset({1})]
    pats = ref.frequent_patterns(txs, 0.5, 3)
    # f(1)=1.0 > .5 yes; f(2)=0.5 not > .5; f(1,2)=0.5 no
    assert pats == {"1": 1.0}


def test_frequent_patterns_multi_level():
    txs = [frozenset({1, 2, 3})] * 3 + [frozenset({4})]
    pats = ref.frequent_patterns(txs, 0.5, 3)
    assert "1|2|3" in pats and pats["1|2|3"] == pytest.approx(0.75)


def test_frequent_patterns_empty_db():
    assert ref.frequent_patterns([], 0.1) == {}


def test_frequent_patterns_respects_max_len():
    txs = [frozenset({1, 2, 3})] * 4
    pats = ref.frequent_patterns(txs, 0.1, 2)
    assert "1|2|3" not in pats and "1|2" in pats


def test_apriori_candidates_requires_all_subpatterns():
    # {1,2},{1,3} qualified but {2,3} not -> no candidate {1,2,3}
    assert ref.apriori_candidates(["1|2", "1|3"]) == []
    assert ref.apriori_candidates(["1|2", "1|3", "2|3"]) == ["1|2|3"]


def test_apriori_candidate_pairs_parents():
    out = ref.apriori_candidate_pairs(["1|2", "1|3", "2|3"])
    assert out == [("1|2|3", "1|2", "1|3")]


def test_se_tree_candidates_prefix_pairs():
    out = ref.se_tree_candidates(["1", "2", "3"])
    assert ("1|2", "1", "2") in out and ("2|3", "2", "3") in out
    assert len(out) == 3


def test_se_tree_candidates_no_subset_check():
    """SE-tree extension only needs the sibling pair (Alg. 4), unlike Alg. 2."""
    out = ref.se_tree_candidates(["1|2", "1|3"])
    assert out == [("1|2|3", "1|2", "1|3")]


# ---------------------------------------------------------------- hypothesis


def random_instance(draw):
    n = draw(st.integers(4, 9))
    all_edges = list(combinations(range(n), 2))
    edges = set(draw(st.lists(st.sampled_from(all_edges), min_size=3, max_size=len(all_edges), unique=True)))
    freqs = {i: draw(st.floats(0.05, 1.0)) for i in range(n)}
    return edges, freqs


@st.composite
def instances(draw):
    return random_instance(draw)


@settings(max_examples=60, deadline=None)
@given(instances(), st.floats(0.0, 2.0))
def test_mptd_fixpoint_property(inst, alpha):
    """Every surviving edge has eco > alpha, and the result is maximal
    (no removed edge would have eco > alpha if re-added... maximality is
    ensured by construction; we verify the fixpoint condition and
    idempotence)."""
    edges, freqs = inst
    out = ref.mptd(edges, freqs, alpha)
    if out:
        eco = ref.edge_cohesions(out, freqs)
        assert min(eco.values()) > alpha
    assert ref.mptd(out, freqs, alpha) == out


@settings(max_examples=60, deadline=None)
@given(instances(), st.floats(0.0, 1.0), st.floats(0.0, 1.0))
def test_truss_monotone_in_alpha(inst, a1, a2):
    """alpha1 <= alpha2 implies C*(alpha2) ⊆ C*(alpha1)."""
    edges, freqs = inst
    lo, hi = min(a1, a2), max(a1, a2)
    assert ref.mptd(edges, freqs, hi) <= ref.mptd(edges, freqs, lo)


@settings(max_examples=40, deadline=None)
@given(instances())
def test_decomposition_equation_1_property(inst):
    edges, freqs = inst
    levels = ref.decompose(edges, freqs)
    grid = sorted(set(levels.values()))
    for a in [0.0] + grid:
        assert ref.truss_at(levels, a) == ref.mptd(edges, freqs, a)


@st.composite
def tiny_dbnets(draw):
    n = draw(st.integers(4, 7))
    all_edges = list(combinations(range(n), 2))
    edges = set(
        draw(st.lists(st.sampled_from(all_edges), min_size=4, max_size=len(all_edges), unique=True))
    )
    items = list(range(draw(st.integers(2, 4))))
    db = {}
    for v in range(n):
        n_tx = draw(st.integers(1, 4))
        txs = []
        for _ in range(n_tx):
            t = draw(st.lists(st.sampled_from(items), min_size=1, max_size=len(items), unique=True))
            txs.append(frozenset(t))
        db[v] = txs
    return ref.PyDBNet(edges=edges, db=db)


@settings(max_examples=25, deadline=None)
@given(tiny_dbnets(), st.floats(0.0, 1.5))
def test_theorem_5_1_graph_anti_monotonicity(net, alpha):
    """p1 ⊆ p2 implies C*_{p2}(α) ⊆ C*_{p1}(α)."""
    items = sorted(net.items)
    if len(items) < 2:
        return
    p1 = items[:1]
    p2 = items[:2]
    f1 = ref.vertex_frequencies(net.db, p1)
    f2 = ref.vertex_frequencies(net.db, p2)
    t1 = ref.mptd(ref.theme_subgraph(net.edges, f1), f1, alpha)
    t2 = ref.mptd(ref.theme_subgraph(net.edges, f2), f2, alpha)
    assert t2 <= t1


@settings(max_examples=25, deadline=None)
@given(tiny_dbnets(), st.floats(0.0, 1.0))
def test_proposition_5_3_intersection(net, alpha):
    """p1, p2 ⊆ p3 implies C*_{p3} ⊆ C*_{p1} ∩ C*_{p2}."""
    items = sorted(net.items)
    if len(items) < 2:
        return
    trusses = {}
    for p in ([items[0]], [items[1]], items[:2]):
        f = ref.vertex_frequencies(net.db, p)
        trusses[tuple(p)] = ref.mptd(ref.theme_subgraph(net.edges, f), f, alpha)
    assert trusses[tuple(items[:2])] <= (
        trusses[(items[0],)] & trusses[(items[1],)]
    )


@settings(max_examples=15, deadline=None)
@given(tiny_dbnets(), st.floats(0.0, 0.8))
def test_tcfa_reference_matches_brute_force(net, alpha):
    assert ref.tcfa_reference(net, alpha) == ref.brute_force_trusses(net, alpha)
