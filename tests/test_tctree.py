"""TC-Tree build (Algorithm 4) and query answering (Algorithm 5)."""
from __future__ import annotations

import pytest

from repro.core import reference as ref
from repro.core.reference import pattern_items
from repro.core.tcfi import run_tcfi
from repro.core.tctree import TCTree
from repro.dbnet import generator as gen


@pytest.fixture(scope="module")
def tiny(spark):
    net, truths = gen.planted_network(
        spark,
        n_vertices=24,
        n_items=6,
        n_communities=2,
        community_size=6,
        theme_len=2,
        theme_freq=0.8,
        p_intra=1.0,
        tx_per_vertex=8,
        noise_tx_len=0.8,
        n_background_edges=10,
        seed=31,
    )
    net.edges.persist()
    net.transactions.persist()
    return net, net.to_python(), truths


@pytest.fixture(scope="module")
def tree(tiny):
    net, _, _ = tiny
    t, report = TCTree.build(net)
    return t, report


def test_tree_nodes_are_alpha0_trusses(tree, tiny):
    """Every tree node stores the decomposition of a non-empty C*_p(0), and
    there is a node for *every* pattern with non-empty C*_p(0)."""
    t, _ = tree
    _, py, _ = tiny
    want = ref.brute_force_trusses(py, 0.0)
    assert set(t.nodes) == set(want)
    for pid, node in t.nodes.items():
        assert set(node.decomp.truss_edges(0.0)) == want[pid]


def test_tree_decompositions_exact(tree, tiny):
    """Node payloads reconstruct C*_p(alpha) for every decomposition level."""
    t, _ = tree
    _, py, _ = tiny
    for pid, node in list(t.nodes.items())[:10]:
        p = pattern_items(pid)
        f = ref.vertex_frequencies(py.db, p)
        sub = ref.theme_subgraph(py.edges, f)
        want_levels = ref.decompose(sub, f)
        for a in [0.0] + node.decomp.levels():
            assert set(node.decomp.truss_edges(a)) == ref.truss_at(want_levels, a)


def test_tree_structure_prefix_links(tree):
    """Children extend the parent by one item greater than the parent's last
    item (SE-tree order ≺)."""
    t, _ = tree
    for pid, node in t.nodes.items():
        items = pattern_items(pid)
        for c in node.children:
            citems = pattern_items(c)
            assert citems[:-1] == items
            assert citems[-1] > items[-1]


def test_tree_root_children_sorted(tree):
    t, _ = tree
    singles = [pattern_items(p)[0] for p in t.root_children]
    assert singles == sorted(singles)
    assert all(len(pattern_items(p)) == 1 for p in t.root_children)


def test_query_qba_matches_mptd(tree, tiny):
    """QBA (q = S): the answer at alpha equals brute force at alpha."""
    t, _ = tree
    _, py, _ = tiny
    for alpha in (0.0, 0.3, 1.0):
        got = {pid: set(es) for pid, es in t.query(None, alpha).items()}
        want = ref.brute_force_trusses(py, alpha)
        assert got == want, alpha


def test_query_qbp_matches_subpattern_filter(tree, tiny):
    """QBP: answer for pattern q at alpha contains exactly the non-empty
    trusses of sub-patterns of q."""
    t, _ = tree
    _, py, _ = tiny
    all0 = ref.brute_force_trusses(py, 0.0)
    longest = max(all0, key=lambda p: len(pattern_items(p)))
    q = set(pattern_items(longest))
    got = {pid: set(es) for pid, es in t.query(q, 0.0).items()}
    want = {p: es for p, es in all0.items() if set(pattern_items(p)) <= q}
    assert got == want


def test_query_alpha_star_empty(tree):
    t, _ = tree
    assert t.query(None, t.alpha_star()) == {}
    assert t.query(None, t.alpha_star() - 1e-9) != {}


def test_query_empty_pattern(tree):
    t, _ = tree
    assert t.query([], 0.0) == {}


def test_query_unknown_items(tree):
    t, _ = tree
    assert t.query([9999], 0.0) == {}


def test_query_matches_tcfi(tree, tiny):
    """Cross-check the index against the online finder at a nonzero alpha."""
    t, _ = tree
    net, _, _ = tiny
    res = run_tcfi(net, 0.25)
    got = {pid: set(es) for pid, es in t.query(None, 0.25).items()}
    assert got == res.to_python()
    res.unpersist()


def test_build_report(tree):
    t, report = tree
    assert report.n_nodes == len(t.nodes)
    assert report.wall_seconds > 0
    assert report.payload_bytes == sum(n.decomp.nbytes() for n in t.nodes.values())
    assert report.levels[0][0] == 1
    # level k candidate counts bound the kept-node counts
    assert all(kept <= cands for _k, cands, kept in report.levels)


def test_max_depth_and_sampling(tree):
    t, _ = tree
    d = t.max_depth()
    assert d >= 1
    pids = t.sample_patterns_by_depth(d, 5, seed=1)
    assert 1 <= len(pids) <= 5
    assert all(len(pattern_items(p)) == d for p in pids)
    assert t.sample_patterns_by_depth(d, 5, seed=1) == pids  # deterministic


def test_max_len_build(tiny):
    net, py, _ = tiny
    t, _ = TCTree.build(net, max_len=1)
    want = {p for p in ref.brute_force_trusses(py, 0.0) if len(pattern_items(p)) == 1}
    assert set(t.nodes) == want
