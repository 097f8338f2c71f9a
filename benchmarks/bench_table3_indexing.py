"""Benchmark: Table 3 — TC-Tree indexing time / memory / #nodes per dataset.

The paper's numbers (hours, tens of GB, 10^7–10^8 nodes on the full
datasets) are compared by *shape* in EXPERIMENTS.md; these benchmarks run
the identical pipeline at reduced scale."""
from __future__ import annotations

import pytest

from jobs.table3_indexing import build_network
from repro.core.tctree import TCTree


@pytest.mark.parametrize("name", ["BK", "GW", "AMINER", "SYN"])
def test_table3_row(benchmark, spark, name):
    net = build_network(spark, name)
    net.edges.persist()
    net.transactions.persist()
    net.edges.count()
    net.transactions.count()

    def build():
        tree, report = TCTree.build(net)
        return tree, report

    tree, report = benchmark.pedantic(build, rounds=1, iterations=1)
    assert report.n_nodes > 0
    benchmark.extra_info.update(
        {
            "nodes": report.n_nodes,
            "payload_mb": round(report.payload_bytes / 2**20, 3),
            "peak_rss_mb": round(report.peak_rss_mb, 1),
            "max_depth": tree.max_depth(),
        }
    )
    net.edges.unpersist()
    net.transactions.unpersist()
