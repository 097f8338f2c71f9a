"""Smoke + correctness tests for the experiment jobs (one per paper table /
figure-claim). Each runs the real harness at reduced scale and checks the
structural claims the paper's table carries."""
from __future__ import annotations

import pytest

from jobs import fig3_params, fig4_scalability, fig5_query, table2_stats, table4_case_study


def test_table2_run_columns(spark):
    df = table2_stats.run(spark, sf=0.002, syn_vertices=150)
    assert list(df["dataset"]) == ["BK", "GW", "AMINER", "SYN"]
    for col in ("vertices", "edges", "transactions", "items_total", "items_unique"):
        assert (df[col] > 0).all(), col
    # measured vs paper-scaled targets agree within generator tolerance
    ratio = df["edges"] / df["paper_edges_scaled"]
    assert ((ratio > 0.5) & (ratio < 2.0)).all()


def test_table4_case_study_recovers_themes(spark):
    df = table4_case_study.run(spark)
    assert list(df["theme"]) == ["p1", "p2", "p3", "p4", "p5", "p6"]
    assert bool(df["found"].all())
    assert (df["community_size"] >= 3).all()
    # Theorem 5.1 shrinkage: the p2 community is strictly inside p1's
    assert df.attrs["p2_subset_of_p1"]
    # Figures 6(e)-(f): heavy vertex overlap, different themes
    assert df.attrs["p5_p6_vertex_overlap"] >= 2
    assert df.attrs["p5_p6_theme_differs"]


def test_fig3_run_shape_claims(spark):
    df = fig3_params.run(
        spark, dataset="BK", n_edges=80, alphas=(0.0, 0.5), epsilons=(0.2,), max_len=3
    )
    # TCFA and TCFI agree exactly on NP/NV/NE for every alpha
    for alpha in (0.0, 0.5):
        sl = df[df["alpha"] == alpha].set_index("method")
        for col in ("NP", "NV", "NE"):
            assert sl.loc["TCFA", col] == sl.loc["TCFI", col], (alpha, col)
        # TCS is lossy-or-equal
        assert sl.loc["TCS(eps=0.2)", "NP"] <= sl.loc["TCFA", "NP"]
        # TCFI's MPTD workload never exceeds TCFA's
        assert sl.loc["TCFI", "mptd_calls"] <= sl.loc["TCFA", "mptd_calls"]
    # NP falls (weakly) as alpha grows
    tcfi = df[df["method"] == "TCFI"].sort_values("alpha")
    assert tcfi["NP"].is_monotonic_decreasing


def test_fig4_run_shape_claims(spark):
    df = fig4_scalability.run(spark, dataset="BK", sizes=(60, 140), max_len=3)
    # NP grows (weakly) with network size for the exact methods
    tcfi = df[df["method"] == "TCFI"].sort_values("edges")
    assert tcfi["NP"].is_monotonic_increasing
    # trusses stay small on average (the paper's §7.2 observation)
    assert (df["NV/NP"].fillna(0) < 60).all()


def test_fig5_query_sweeps(spark):
    tree = fig5_query.build_tree(spark, "BK", sf=0.004)
    qba = fig5_query.qba_sweep(tree, step=0.2, repeats=3)
    assert len(qba) >= 1
    # RN falls as alpha grows (Figure 5(a)-(d))
    assert qba["retrieved_nodes"].is_monotonic_decreasing
    assert qba.iloc[0]["retrieved_nodes"] == tree.n_nodes
    qbp = fig5_query.qbp_sweep(tree, n_queries=10, repeats=3)
    assert len(qbp) == tree.max_depth()
    # RN grows with query pattern length (Figure 5(e)-(h))
    assert qbp["avg_retrieved_nodes"].is_monotonic_increasing
