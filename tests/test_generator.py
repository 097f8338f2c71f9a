"""Tests for the database-network generators (dbnet substrate)."""
from __future__ import annotations

import numpy as np
import pytest
from pyspark.sql import functions as F

from repro.core import reference as ref
from repro.dbnet import generator as gen
from repro.dbnet.sampling import bfs_sample
from repro.dbnet.stats import network_stats


@pytest.fixture(scope="module")
def planted(spark):
    net, truths = gen.planted_network(
        spark, n_vertices=60, n_items=20, n_communities=3, community_size=6,
        theme_len=2, theme_freq=0.7, tx_per_vertex=8, seed=42,
    )
    net.edges.persist()
    net.transactions.persist()
    return net, truths


def test_edges_canonical(planted):
    net, _ = planted
    assert net.edges.filter(F.col("u") >= F.col("v")).count() == 0


def test_edges_deduped(planted):
    net, _ = planted
    assert net.edges.count() == net.edges.distinct().count()


def test_transactions_distinct_items(planted):
    net, _ = planted
    assert (
        net.transactions.count()
        == net.transactions.select("vid", "tid", "item").distinct().count()
    )


def test_every_vertex_has_transactions(planted):
    net, _ = planted
    with_tx = net.transactions.select("vid").distinct().count()
    assert with_tx == net.vertices.count()


def test_items_within_universe(planted):
    net, _ = planted
    mx = net.transactions.agg(F.max("item")).collect()[0][0]
    assert 0 <= mx < net.n_items


def test_ground_truth_members_are_vertices(planted):
    net, truths = planted
    n = net.vertices.count()
    for t in truths:
        assert all(0 <= m < n for m in t.members)
        assert len(t.members) == 6


def test_planted_theme_is_frequent_on_members(planted):
    """Each member's database contains the theme with frequency near
    theme_freq — the statistical contract the finders rely on."""
    net, truths = planted
    py = net.to_python()
    for t in truths:
        fs = ref.vertex_frequencies(py.db, t.theme)
        member_f = [fs.get(m, 0.0) for m in t.members]
        assert np.mean(member_f) > 0.4


def test_generator_deterministic(spark):
    a, _ = gen.planted_network(spark, n_vertices=30, seed=5)
    b, _ = gen.planted_network(spark, n_vertices=30, seed=5)
    assert sorted(map(tuple, a.edges.collect())) == sorted(map(tuple, b.edges.collect()))
    assert sorted(map(tuple, a.transactions.collect())) == sorted(
        map(tuple, b.transactions.collect())
    )


def test_generator_seed_changes_output(spark):
    a, _ = gen.planted_network(spark, n_vertices=30, seed=5)
    b, _ = gen.planted_network(spark, n_vertices=30, seed=6)
    assert sorted(map(tuple, a.edges.collect())) != sorted(map(tuple, b.edges.collect()))


def test_to_python_roundtrip(planted):
    net, _ = planted
    py = net.to_python()
    assert len(py.vertices) == net.vertices.count()
    assert len(py.edges) == net.edges.count()
    n_tx = net.transactions.select("vid", "tid").distinct().count()
    assert sum(len(v) for v in py.db.values()) == n_tx


@pytest.mark.parametrize("name", ["BK", "GW", "AMINER"])
def test_paper_like_ratios(spark, name):
    """Table-2 shape: vertex/edge/transaction counts scale with sf."""
    sf = 0.002
    net, _ = gen.paper_like_network(spark, name, sf=sf)
    s = network_stats(net)
    cfg = gen.PAPER_TABLE2[name]
    assert s["vertices"] == pytest.approx(cfg["v"] * sf, rel=0.1)
    assert s["edges"] == pytest.approx(cfg["e"] * sf, rel=0.35)
    assert s["transactions"] == pytest.approx(cfg["tx"] * sf, rel=0.35)
    assert s["items_unique"] <= cfg["items_unique"]


def test_syn_network_formulas(spark):
    """SYN: n_tx(v) = ceil(e^{0.1 deg}) within the degree cap."""
    net = gen.syn_network(spark, n_vertices=80, m_attach=3, n_items=40, seed=1)
    deg = (
        net.edges.select(F.col("u").alias("vid"))
        .union(net.edges.select(F.col("v").alias("vid")))
        .groupBy("vid")
        .agg(F.count("*").alias("deg"))
    )
    ntx = net.transactions.select("vid", "tid").distinct().groupBy("vid").agg(
        F.count("*").alias("n_tx")
    )
    joined = {r.vid: (r.deg, r.n_tx) for r in deg.join(ntx, "vid").collect()}
    checked = 0
    for vid, (d, n) in joined.items():
        if d <= 40:  # default deg_cap; beyond it the formula is clamped
            assert n == int(np.ceil(np.exp(0.1 * d))), (vid, d, n)
            checked += 1
    assert checked > 50


def test_syn_deterministic(spark):
    a = gen.syn_network(spark, n_vertices=50, seed=9)
    b = gen.syn_network(spark, n_vertices=50, seed=9)
    assert sorted(map(tuple, a.transactions.collect())) == sorted(
        map(tuple, b.transactions.collect())
    )


def test_case_study_network_structure(spark):
    net, themes, item_names, author_names = gen.case_study_network(spark)
    assert set(themes) == {"p1", "p2", "p3", "p4", "p5", "p6"}
    # p1 ⊂ p2 as patterns
    assert set(themes["p1"]) < set(themes["p2"])
    # item names cover every theme item
    for t in themes.values():
        for i in t:
            assert i in item_names
    assert net.vertices.count() == len(author_names)


def test_bfs_sample_size_and_closure(planted):
    net, _ = planted
    sub = bfs_sample(net, 30, seed=1)
    assert sub.edges.count() == 30
    # every transaction vertex is an endpoint of a sampled edge
    vids = {r.vid for r in sub.vertices.collect()}
    tx_vids = {r.vid for r in sub.transactions.select("vid").distinct().collect()}
    assert tx_vids <= vids


def test_bfs_sample_is_subgraph(planted):
    net, _ = planted
    sub = bfs_sample(net, 25, seed=2)
    all_edges = {(r.u, r.v) for r in net.edges.collect()}
    sub_edges = {(r.u, r.v) for r in sub.edges.collect()}
    assert sub_edges <= all_edges


def test_bfs_sample_deterministic(planted):
    net, _ = planted
    a = bfs_sample(net, 20, seed=3)
    b = bfs_sample(net, 20, seed=3)
    assert sorted(map(tuple, a.edges.collect())) == sorted(map(tuple, b.edges.collect()))


def test_network_stats_fields(planted):
    net, _ = planted
    s = network_stats(net)
    assert set(s) == {"vertices", "edges", "transactions", "items_total", "items_unique"}
    assert s["items_total"] >= s["transactions"] >= 1
