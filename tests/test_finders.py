"""End-to-end finder tests: TCS, TCFA, TCFI against each other and against
brute-force enumeration of the full pattern lattice (the exactness claims of
Section 7.1: TCFA ≡ TCFI exact for every alpha; TCS lossy depending on ε).

Finder runs are expensive (one Spark job per lattice level), so each run is
a module-scoped fixture shared by several assertions.
"""
from __future__ import annotations

import pytest

from repro.core import reference as ref
from repro.core.tcs import enumerate_candidates, run_tcs
from repro.core.tcfa import run_tcfa
from repro.core.tcfi import run_tcfi
from repro.dbnet import generator as gen
from repro.metrics import truss_metrics, truss_metrics_py


@pytest.fixture(scope="module")
def tiny(spark):
    """Very small planted network with a tiny item universe so brute force
    over all 2^|S| patterns is feasible."""
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
def brute0(tiny):
    _, py, _ = tiny
    return ref.brute_force_trusses(py, 0.0)


@pytest.fixture(scope="module")
def tcfa0(tiny):
    net, _, _ = tiny
    return run_tcfa(net, 0.0)


@pytest.fixture(scope="module")
def tcfi0(tiny):
    net, _, _ = tiny
    return run_tcfi(net, 0.0)


def test_tcfa_matches_brute_force_alpha0(tcfa0, brute0):
    assert tcfa0.to_python() == brute0


def test_tcfi_matches_brute_force_alpha0(tcfi0, brute0):
    assert tcfi0.to_python() == brute0


@pytest.mark.parametrize("alpha", [0.3, 0.8])
def test_tcfi_matches_brute_force_positive_alpha(tiny, alpha):
    net, py, _ = tiny
    res = run_tcfi(net, alpha)
    assert res.to_python() == ref.brute_force_trusses(py, alpha)
    res.unpersist()


def test_tcfa_matches_tcfi_positive_alpha(tiny):
    net, py, _ = tiny
    res = run_tcfa(net, 0.5)
    assert res.to_python() == ref.brute_force_trusses(py, 0.5)
    res.unpersist()


def test_tcfi_prunes_at_least_as_much(tcfa0, tcfi0):
    """TCFI never evaluates more candidates through MPTD than TCFA —
    the intersection pre-check only removes work (Prop. 5.3)."""
    assert tcfi0.mptd_calls <= tcfa0.mptd_calls
    assert tcfi0.candidates == tcfa0.candidates  # same Apriori lattice


def test_tcs_subset_of_exact(tiny, brute0):
    """TCS with ε > 0 returns a subset of the exact trusses, and each truss
    it does return is exactly right (the pre-filter only drops patterns)."""
    net, _, _ = tiny
    res = run_tcs(net, 0.0, eps=0.2)
    got = res.to_python()
    assert set(got) <= set(brute0)
    for pid, edges in got.items():
        assert edges == brute0[pid]
    res.unpersist()


def test_tcs_can_lose_communities(spark):
    """The paper's accuracy-loss mechanism: a pattern infrequent on every
    vertex (f = 0.25 < ε = 0.3) still forms a dense truss; TCS drops it,
    the exact finders keep it."""
    import pandas as pd

    n = 6
    edges = [(i, j) for i in range(n) for j in range(i + 1, n)]
    tx_rows = []
    for vid in range(n):
        # 1 of 4 transactions contains item 0 → f(0) = 0.25 on every vertex
        tx_rows.append((vid, 0, 0))
        for tid in range(1, 4):
            tx_rows.append((vid, tid, 1 + vid))
    net = gen.DatabaseNetwork(
        vertices=spark.createDataFrame(pd.DataFrame({"vid": range(n)})),
        edges=spark.createDataFrame(edges, "u long, v long"),
        transactions=spark.createDataFrame(tx_rows, "vid long, tid long, item long"),
        n_items=n + 1,
    )
    exact = run_tcfi(net, alpha=0.5)
    lossy = run_tcs(net, alpha=0.5, eps=0.3)
    assert "0" in exact.to_python()  # K6 with f=0.25: eco = 4*0.25 = 1.0 > 0.5
    assert "0" not in lossy.to_python()
    exact.unpersist()
    lossy.unpersist()


def test_tcs_enumerate_candidates_matches_reference(tiny):
    net, py, _ = tiny
    got = {r.pid for r in enumerate_candidates(net.transactions, 0.3, 3).collect()}
    want = set()
    for txs in py.db.values():
        want |= set(ref.frequent_patterns(txs, 0.3, 3))
    assert got == want


def test_planted_themes_recovered(tcfi0, tiny):
    """The planted theme patterns must appear among the detected trusses and
    their communities must cover the planted members."""
    _, _, truths = tiny
    got = tcfi0.to_python()
    for t in truths:
        pid = ref.pattern_id(t.theme)
        assert pid in got, pid
        covered = {x for e in got[pid] for x in e}
        assert set(t.members) <= covered


def test_metrics_spark_vs_python(tcfi0):
    assert truss_metrics(tcfi0.truss_edges) == truss_metrics_py(tcfi0.to_python())


def test_finder_reports_populated(tcfi0):
    assert tcfi0.wall_seconds > 0
    assert tcfi0.levels[0].k == 1
    assert tcfi0.candidates >= tcfi0.mptd_calls >= 1
    assert all(s.qualified <= s.mptd_calls for s in tcfi0.levels)


def test_alpha_monotone_np(tiny, tcfi0):
    """Larger alpha → fewer (or equal) detected trusses (NP), matching the
    downward trends of Figure 3."""
    net, _, _ = tiny
    res = run_tcfi(net, 0.8)
    assert res.metrics()["NP"] <= tcfi0.metrics()["NP"]
    res.unpersist()
