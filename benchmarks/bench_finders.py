"""Benchmarks: Figures 3–4 — TCS vs TCFA vs TCFI runtime on a BFS-sampled
paper-shaped network (worst case α = 0, where the paper reports the largest
gaps). NP and MPTD-call counts land in extra_info for EXPERIMENTS.md."""
from __future__ import annotations

import pytest

from jobs.fig3_params import sampled_network
from repro.core.tcs import run_tcs
from repro.core.tcfa import run_tcfa
from repro.core.tcfi import run_tcfi


@pytest.fixture(scope="module")
def net(spark):
    return sampled_network(spark, "BK", n_edges=400)


def _record(benchmark, res):
    m = res.metrics()
    benchmark.extra_info.update(
        {"NP": m["NP"], "NV": m["NV"], "NE": m["NE"], "mptd_calls": res.mptd_calls}
    )
    res.unpersist()


def test_finder_tcs(benchmark, net):
    res = benchmark.pedantic(
        lambda: run_tcs(net, 0.0, eps=0.2, max_len=4), rounds=1, iterations=1
    )
    _record(benchmark, res)


def test_finder_tcfa(benchmark, net):
    res = benchmark.pedantic(lambda: run_tcfa(net, 0.0, max_len=4), rounds=1, iterations=1)
    _record(benchmark, res)


def test_finder_tcfi(benchmark, net):
    res = benchmark.pedantic(lambda: run_tcfi(net, 0.0, max_len=4), rounds=1, iterations=1)
    _record(benchmark, res)
