"""Benchmark: Table 2 — generating the evaluation networks and computing
their statistics. One benchmark per dataset row; the measured output (paper
vs ours) is recorded in EXPERIMENTS.md."""
from __future__ import annotations

import pytest

from jobs.table2_stats import build_network
from repro.dbnet.stats import network_stats


@pytest.mark.parametrize("name", ["BK", "GW", "AMINER", "SYN"])
def test_table2_row(benchmark, spark, name):
    def make_and_stat():
        net = build_network(spark, name)
        return network_stats(net)

    stats = benchmark.pedantic(make_and_stat, rounds=1, iterations=1)
    assert stats["vertices"] > 0 and stats["edges"] > 0
    benchmark.extra_info.update(stats)
