"""Triangle enumeration and edge cohesion vs DuckDB SQL and the reference."""
from __future__ import annotations

import pandas as pd
import pytest

from repro.core import reference as ref
from repro.core.triangles import edge_cohesion, triangles
from repro.oracle import assert_equivalent

ECO_ORACLE_SQL = """
WITH tri AS (
  SELECT e1.pid AS pid, e1.u AS a, e1.v AS b, e2.v AS c,
         least(e1.fu, e1.fv, e2.fv) AS minf
  FROM pe e1
  JOIN pe e2 ON e1.pid = e2.pid AND e1.v = e2.u
  JOIN pe e3 ON e3.pid = e1.pid AND e3.u = e1.u AND e3.v = e2.v
), contrib AS (
  SELECT pid, a AS u, b AS v, minf FROM tri
  UNION ALL SELECT pid, b, c, minf FROM tri
  UNION ALL SELECT pid, a, c, minf FROM tri
)
SELECT e.pid AS pid, e.u AS u, e.v AS v, e.fu AS fu, e.fv AS fv,
       COALESCE(s.eco, 0.0) AS eco
FROM pe e LEFT JOIN (
  SELECT pid, u, v, SUM(minf) AS eco FROM contrib GROUP BY pid, u, v
) s ON e.pid = s.pid AND e.u = s.u AND e.v = s.v
"""


def _pe_frame(spark, edges, freqs, pid="p"):
    rows = [
        (pid, u, v, float(freqs[u]), float(freqs[v])) for u, v in sorted(edges)
    ]
    return spark.createDataFrame(rows, "pid string, u long, v long, fu double, fv double")


@pytest.fixture(scope="module")
def toy(spark):
    edges = {(1, 2), (1, 3), (2, 3), (1, 5), (2, 5), (3, 4), (4, 5), (3, 5)}
    freqs = {1: 0.5, 2: 0.4, 3: 0.1, 4: 0.6, 5: 0.1}
    return _pe_frame(spark, edges, freqs), edges, freqs


def test_triangle_count_k4(spark):
    edges = {(0, 1), (0, 2), (0, 3), (1, 2), (1, 3), (2, 3)}
    pe = _pe_frame(spark, edges, {i: 1.0 for i in range(4)})
    assert triangles(pe).count() == 4


def test_triangles_each_once(toy):
    pe, edges, _ = toy
    tris = [(r.a, r.b, r.c) for r in triangles(pe).collect()]
    assert len(tris) == len(set(tris))
    for a, b, c in tris:
        assert a < b < c
        assert {(a, b), (b, c), (a, c)} <= edges


def test_cohesion_matches_duckdb(toy, spark):
    pe, _, _ = toy
    got = edge_cohesion(pe)
    assert_equivalent(got, ECO_ORACLE_SQL, pe=pe)


def test_cohesion_matches_reference(toy):
    pe, edges, freqs = toy
    want = ref.edge_cohesions(edges, freqs)
    got = {(r.u, r.v): r.eco for r in edge_cohesion(pe).collect()}
    assert got == pytest.approx(want)


def test_cohesion_example_3_2(toy):
    pe, _, _ = toy
    got = {(r.u, r.v): r.eco for r in edge_cohesion(pe).collect()}
    assert got[(1, 2)] == pytest.approx(0.2)


def test_cohesion_triangle_free_edge_zero(spark):
    pe = _pe_frame(spark, {(0, 1), (1, 2)}, {0: 1.0, 1: 1.0, 2: 1.0})
    got = {(r.u, r.v): r.eco for r in edge_cohesion(pe).collect()}
    assert got == {(0, 1): 0.0, (1, 2): 0.0}


def test_cohesion_multi_pattern_batch_isolated(spark):
    """Patterns in the same batch must not see each other's triangles."""
    e1 = {(0, 1), (0, 2), (1, 2)}
    f1 = {0: 1.0, 1: 1.0, 2: 1.0}
    e2 = {(0, 1), (1, 2)}  # same vertex ids, no triangle
    f2 = {0: 0.5, 1: 0.5, 2: 0.5}
    both = _pe_frame(spark, e1, f1, "a").union(_pe_frame(spark, e2, f2, "b"))
    got = {(r.pid, r.u, r.v): r.eco for r in edge_cohesion(both).collect()}
    assert got[("a", 0, 1)] == pytest.approx(1.0)
    assert got[("b", 0, 1)] == 0.0


def test_cohesion_random_vs_reference(spark, small_py):
    """Edge cohesion over the real planted network for one pattern."""
    items = sorted(small_py.items)
    f = ref.vertex_frequencies(small_py.db, items[:1])
    edges = ref.theme_subgraph(small_py.edges, f)
    pe = _pe_frame(spark, edges, f)
    want = ref.edge_cohesions(edges, f)
    got = {(r.u, r.v): r.eco for r in edge_cohesion(pe).collect()}
    assert got == pytest.approx(want)
