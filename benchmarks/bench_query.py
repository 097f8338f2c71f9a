"""Benchmarks: Figure 5 — TC-Tree query answering (QBA and QBP).

The tree is built once (not timed); benchmarks time only Algorithm 5. The
paper's headline rate is ~10^6 retrieved trusses per second — we record
nodes/second in extra_info."""
from __future__ import annotations

import pytest

from jobs.fig5_query import build_tree
from repro.core.reference import pattern_items


@pytest.fixture(scope="module")
def tree(spark):
    return build_tree(spark, "GW", sf=0.002)


def test_qba_alpha0(benchmark, tree):
    ans = benchmark(lambda: tree.query(None, 0.0))
    assert len(ans) == tree.n_nodes
    benchmark.extra_info["retrieved_nodes"] = len(ans)


def test_qba_mid_alpha(benchmark, tree):
    alpha = tree.alpha_star() / 2
    ans = benchmark(lambda: tree.query(None, alpha))
    benchmark.extra_info["retrieved_nodes"] = len(ans)


def test_qbp_depth1(benchmark, tree):
    pids = tree.sample_patterns_by_depth(1, 20, seed=1)
    ans = benchmark(lambda: [tree.query(pattern_items(p), 0.0) for p in pids])
    benchmark.extra_info["avg_retrieved"] = sum(len(a) for a in ans) / len(ans)


def test_qbp_max_depth(benchmark, tree):
    d = tree.max_depth()
    pids = tree.sample_patterns_by_depth(d, 20, seed=1)
    ans = benchmark(lambda: [tree.query(pattern_items(p), 0.0) for p in pids])
    assert all(len(a) >= 1 for a in ans)
    benchmark.extra_info["avg_retrieved"] = sum(len(a) for a in ans) / len(ans)
