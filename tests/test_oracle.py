"""Self-checks for the DuckDB oracle (repro.oracle): it must accept equal
results regardless of row/column order, and reject wrong ones — otherwise
every oracle-based test in the suite is vacuous."""
from __future__ import annotations

import pandas as pd
import pytest

from repro.oracle import assert_equivalent


def test_oracle_accepts_equal(spark):
    df = spark.createDataFrame([(1, "a"), (2, "b")], "k long, s string")
    assert_equivalent(df, "SELECT k, s FROM t", t=pd.DataFrame({"k": [2, 1], "s": ["b", "a"]}))


def test_oracle_accepts_column_reorder(spark):
    df = spark.createDataFrame([(1, "a")], "k long, s string")
    assert_equivalent(df, "SELECT s, k FROM t", t=pd.DataFrame({"k": [1], "s": ["a"]}))


def test_oracle_rejects_wrong_values(spark):
    df = spark.createDataFrame([(1,)], "k long")
    with pytest.raises(AssertionError):
        assert_equivalent(df, "SELECT k + 1 AS k FROM t", t=pd.DataFrame({"k": [1]}))


def test_oracle_rejects_column_mismatch(spark):
    df = spark.createDataFrame([(1,)], "k long")
    with pytest.raises(AssertionError, match="column mismatch"):
        assert_equivalent(df, "SELECT k AS wrong FROM t", t=pd.DataFrame({"k": [1]}))


def test_oracle_accepts_spark_input_tables(spark):
    t = spark.createDataFrame([(1, 2.0), (2, 3.0)], "k long, v double")
    got = t.groupBy().sum("v").withColumnRenamed("sum(v)", "s")
    assert_equivalent(got, "SELECT SUM(v) AS s FROM t", t=t)


def test_oracle_float_rounding_tolerance(spark):
    df = spark.createDataFrame([(0.1 + 0.2,)], "x double")
    assert_equivalent(df, "SELECT 0.3::DOUBLE AS x FROM t LIMIT 1", t=pd.DataFrame({"y": [0]}))
