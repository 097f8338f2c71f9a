"""NP/NV/NE metric semantics (Section 7): multiplicity counting — a vertex
or edge contained in k trusses counts k times."""
from __future__ import annotations

import pytest

from repro.metrics import truss_metrics, truss_metrics_py


def _frame(spark, rows):
    return spark.createDataFrame(rows, "pid string, u long, v long, fu double, fv double")


def test_truss_metrics_multiplicity(spark):
    rows = [
        ("a", 0, 1, 1.0, 1.0),
        ("a", 1, 2, 1.0, 1.0),
        ("b", 0, 1, 1.0, 1.0),  # same edge under a second pattern: counts twice
    ]
    m = truss_metrics(_frame(spark, rows))
    assert m == {"NP": 2, "NE": 3, "NV": 5}  # a:{0,1,2}=3 + b:{0,1}=2


def test_truss_metrics_empty(spark):
    m = truss_metrics(_frame(spark, []))
    assert m == {"NP": 0, "NE": 0, "NV": 0}


def test_truss_metrics_py_matches_spark(spark):
    rows = [
        ("a", 0, 1, 1.0, 1.0),
        ("a", 0, 2, 1.0, 1.0),
        ("c", 5, 7, 1.0, 1.0),
    ]
    py = {"a": {(0, 1), (0, 2)}, "c": {(5, 7)}}
    assert truss_metrics(_frame(spark, rows)) == truss_metrics_py(py)


def test_truss_metrics_py_empty():
    assert truss_metrics_py({}) == {"NP": 0, "NV": 0, "NE": 0}


def test_truss_metrics_py_overlapping_patterns():
    py = {"a": {(0, 1)}, "b": {(0, 1)}, "c": {(0, 1)}}
    m = truss_metrics_py(py)
    assert m == {"NP": 3, "NV": 6, "NE": 3}
