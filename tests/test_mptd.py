"""MPTD on Spark — both the batched-exact and the bulk-synchronous
DataFrame variants — against the reference queue implementation (Alg. 1)."""
from __future__ import annotations

import numpy as np
import pytest

from repro.core import reference as ref
from repro.core.mptd import mptd_batched, mptd_bulk


def _pe_frame(spark, groups):
    """groups: {pid: (edges, freqs)} -> one batched pattern-edge frame."""
    rows = []
    for pid, (edges, freqs) in groups.items():
        for u, v in sorted(edges):
            rows.append((pid, u, v, float(freqs[u]), float(freqs[v])))
    return spark.createDataFrame(
        rows, "pid string, u long, v long, fu double, fv double"
    )


def _collect(df):
    out = {}
    for r in df.collect():
        out.setdefault(r.pid, set()).add((r.u, r.v))
    return out


def _random_groups(n_groups, seed):
    rng = np.random.default_rng(seed)
    groups = {}
    for g in range(n_groups):
        n = int(rng.integers(5, 12))
        pairs = [(i, j) for i in range(n) for j in range(i + 1, n)]
        k = int(rng.integers(5, len(pairs) + 1))
        idx = rng.choice(len(pairs), k, replace=False)
        edges = {pairs[i] for i in idx}
        freqs = {i: float(rng.uniform(0.05, 1.0)) for i in range(n)}
        groups[f"g{g}"] = (edges, freqs)
    return groups


@pytest.mark.parametrize("alpha", [0.0, 0.1, 0.5, 1.0])
def test_mptd_batched_matches_reference(spark, alpha):
    groups = _random_groups(8, seed=int(alpha * 10) + 1)
    got = _collect(mptd_batched(_pe_frame(spark, groups), alpha))
    for pid, (edges, freqs) in groups.items():
        want = ref.mptd(edges, freqs, alpha)
        assert got.get(pid, set()) == want, pid


@pytest.mark.parametrize("alpha", [0.0, 0.3])
def test_mptd_bulk_matches_reference(spark, alpha):
    groups = _random_groups(4, seed=77)
    got = _collect(mptd_bulk(_pe_frame(spark, groups), alpha))
    for pid, (edges, freqs) in groups.items():
        want = ref.mptd(edges, freqs, alpha)
        assert got.get(pid, set()) == want, pid


def test_bulk_and_batched_agree(spark):
    """Deletion order is irrelevant: synchronous rounds and the queue reach
    the same greatest fixpoint."""
    groups = _random_groups(6, seed=5)
    pe = _pe_frame(spark, groups)
    assert _collect(mptd_bulk(pe, 0.2)) == _collect(mptd_batched(pe, 0.2))


def test_mptd_batched_drops_empty_patterns(spark):
    groups = {
        "keep": ({(0, 1), (0, 2), (1, 2)}, {0: 1.0, 1: 1.0, 2: 1.0}),
        "gone": ({(0, 1), (1, 2)}, {0: 1.0, 1: 1.0, 2: 1.0}),  # no triangle
    }
    got = _collect(mptd_batched(_pe_frame(spark, groups), 0.0))
    assert set(got) == {"keep"}


def test_mptd_batched_k_truss_degeneration(spark):
    """f=1 everywhere, alpha=k-3 → k-truss (K5 survives alpha=1, pendant
    triangle does not)."""
    edges = {(i, j) for i in range(5) for j in range(i + 1, 5)} | {
        (4, 5), (4, 6), (5, 6)
    }
    freqs = {i: 1.0 for i in range(7)}
    got = _collect(mptd_batched(_pe_frame(spark, {"p": (edges, freqs)}), 1.0))
    assert got["p"] == {(i, j) for i in range(5) for j in range(i + 1, 5)}


def test_mptd_preserves_frequencies(spark):
    groups = _random_groups(3, seed=9)
    pe = _pe_frame(spark, groups)
    for r in mptd_batched(pe, 0.1).collect():
        _, freqs = groups[r.pid]
        assert r.fu == pytest.approx(freqs[r.u])
        assert r.fv == pytest.approx(freqs[r.v])


def test_mptd_empty_input(spark):
    pe = spark.createDataFrame([], "pid string, u long, v long, fu double, fv double")
    assert mptd_batched(pe, 0.0).count() == 0
    assert mptd_bulk(pe, 0.0).count() == 0
