"""Deep checks of the Table-4 / Figure-6 case study beyond the job-level
smoke test: query semantics, hub membership, and overlapping communities."""
from __future__ import annotations

import pytest

from repro.core.reference import connected_components, pattern_id, pattern_items
from repro.core.tctree import TCTree
from repro.dbnet.generator import CASE_STUDY_THEMES, case_study_network


@pytest.fixture(scope="module")
def study(spark):
    net, theme_items, item_names, author_names = case_study_network(spark)
    net.edges.persist()
    net.transactions.persist()
    tree, _ = TCTree.build(net, max_len=4)
    return net, theme_items, item_names, author_names, tree


def _community_of(tree, items, alpha):
    ans = tree.query(items, alpha)
    pid = pattern_id(items)
    if pid not in ans:
        return set()
    comps = connected_components(set(ans[pid]))
    return max(comps, key=len) if comps else set()


def test_all_six_themes_indexed(study):
    _, theme_items, _, _, tree = study
    for pk, items in theme_items.items():
        assert pattern_id(items) in tree.nodes, pk


def test_qbp_returns_only_subpatterns(study):
    _, theme_items, _, _, tree = study
    q = set(theme_items["p3"])
    for pid in tree.query(q, 0.0):
        assert set(pattern_items(pid)) <= q


def test_hub_memberships(study):
    """hub_B sits in the p1, p3 and p5 communities; hub_C in p1, p3, p4, p6 —
    the overlapping-communities finding of Figures 6(a)-(f)."""
    _, theme_items, _, author_names, tree = study
    names = {}
    for pk in CASE_STUDY_THEMES:
        comm = _community_of(tree, theme_items[pk], 0.2)
        names[pk] = {author_names[v] for v in comm}
    assert "hub_B" in names["p1"] and "hub_B" in names["p3"] and "hub_B" in names["p5"]
    assert {"p1", "p3", "p4", "p6"} <= {pk for pk, ns in names.items() if "hub_C" in ns}


def test_nested_theme_shrinks_community(study):
    """Adding 'intrusion detection' to p1 shrinks the community (Thm 5.1):
    p2's community is a strict subset of p1's."""
    _, theme_items, _, _, tree = study
    c1 = _community_of(tree, theme_items["p1"], 0.2)
    c2 = _community_of(tree, theme_items["p2"], 0.2)
    assert c2 and c2 < c1


def test_interdisciplinary_overlap(study):
    """p5 and p6 communities share bridge authors but have disjoint themes —
    Figure 6(e)-(f)."""
    _, theme_items, _, author_names, tree = study
    c5 = _community_of(tree, theme_items["p5"], 0.2)
    c6 = _community_of(tree, theme_items["p6"], 0.2)
    shared = {author_names[v] for v in (c5 & c6)}
    assert {"bridge_1", "bridge_2"} <= shared
    assert not (set(theme_items["p5"]) & set(theme_items["p6"]))


def test_noise_authors_not_in_theme_communities(study):
    _, theme_items, _, author_names, tree = study
    comm = _community_of(tree, theme_items["p1"], 0.2)
    assert not any(author_names[v].startswith("noise_") for v in comm)
