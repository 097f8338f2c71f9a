"""Pattern-frequency pipeline vs the DuckDB oracle and the Python reference."""
from __future__ import annotations

import pytest
from pyspark.sql import functions as F

from repro.core import reference as ref
from repro.core.frequencies import (
    patterns_df,
    transaction_counts,
    vertex_pattern_frequencies,
)
from repro.oracle import assert_equivalent

FREQ_ORACLE_SQL = """
WITH contain AS (
  SELECT p.pid, t.vid, t.tid
  FROM tx t JOIN pat p ON t.item = p.item
  GROUP BY p.pid, t.vid, t.tid
  HAVING count(*) = max(p.plen)
), ntx AS (
  SELECT vid, count(DISTINCT tid) AS n FROM tx GROUP BY vid
)
SELECT c.pid AS pid, c.vid AS vid,
       CAST(count(*) AS DOUBLE) / max(n.n) AS freq
FROM contain c JOIN ntx n ON c.vid = n.vid
GROUP BY c.pid, c.vid
"""


@pytest.fixture(scope="module")
def some_pids(small_py):
    items = sorted(small_py.items)
    return (
        [str(i) for i in items[:6]]
        + [ref.pattern_id(items[i : i + 2]) for i in range(4)]
        + [ref.pattern_id(items[:3])]
    )


def test_patterns_df_shape(spark):
    pdf = patterns_df(spark, ["1", "2|5"]).orderBy("pid", "item").collect()
    assert [(r.pid, r.item, r.plen) for r in pdf] == [("1", 1, 1), ("2|5", 2, 2), ("2|5", 5, 2)]


def test_patterns_df_empty(spark):
    assert patterns_df(spark, []).count() == 0


def test_transaction_counts(small_net, small_py):
    got = {r.vid: r.n_tx for r in transaction_counts(small_net.transactions).collect()}
    want = {v: len(txs) for v, txs in small_py.db.items() if txs}
    assert got == want


def test_frequencies_match_duckdb_oracle(spark, small_net, some_pids):
    pats = patterns_df(spark, some_pids)
    freqs = vertex_pattern_frequencies(small_net.transactions, pats)
    assert_equivalent(
        freqs,
        FREQ_ORACLE_SQL,
        tx=small_net.transactions,
        pat=pats,
    )


def test_frequencies_match_reference(small_net, small_py, some_pids, spark):
    pats = patterns_df(spark, some_pids)
    got = {
        (r.pid, r.vid): r.freq
        for r in vertex_pattern_frequencies(small_net.transactions, pats).collect()
    }
    for pid in some_pids:
        want = ref.vertex_frequencies(small_py.db, ref.pattern_items(pid))
        for vid, f in want.items():
            assert got[(pid, vid)] == pytest.approx(f)
        assert {v for (p, v) in got if p == pid} == set(want)


def test_frequencies_only_positive(spark, small_net, some_pids):
    pats = patterns_df(spark, some_pids)
    freqs = vertex_pattern_frequencies(small_net.transactions, pats)
    assert freqs.filter(F.col("freq") <= 0).count() == 0
    assert freqs.filter(F.col("freq") > 1.0).count() == 0


def test_frequencies_restrict(spark, small_net, small_py, some_pids):
    """restrict=(pid, vid) frame limits output to exactly those pairs."""
    pats = patterns_df(spark, some_pids)
    full = vertex_pattern_frequencies(small_net.transactions, pats)
    pairs = full.limit(10).select("pid", "vid")
    restricted = vertex_pattern_frequencies(
        small_net.transactions, pats, restrict=pairs
    )
    got = {(r.pid, r.vid): r.freq for r in restricted.collect()}
    want = {(r.pid, r.vid): r.freq for r in pairs.join(full, ["pid", "vid"]).collect()}
    assert got == pytest.approx(want)


def test_frequency_anti_monotone_in_pattern(spark, small_net, small_py):
    """f_i(p1) >= f_i(p2) when p1 ⊆ p2 — the Apriori property the paper's
    Theorem 5.1 proof leans on, verified end-to-end through Spark."""
    items = sorted(small_py.items)
    p1, p2 = str(items[0]), ref.pattern_id(items[:2])
    pats = patterns_df(spark, [p1, p2])
    rows = vertex_pattern_frequencies(small_net.transactions, pats).collect()
    f1 = {r.vid: r.freq for r in rows if r.pid == p1}
    f2 = {r.vid: r.freq for r in rows if r.pid == p2}
    assert set(f2) <= set(f1)
    for v, f in f2.items():
        assert f1[v] >= f - 1e-12
