"""Sanity tests for the provided DuckDB oracle wiring."""
import pandas as pd
import pytest

from repro.oracle import assert_equivalent


def test_accepts_matching_counts(spark):
    df = spark.createDataFrame(pd.DataFrame({"cnt": [3]}))
    t = pd.DataFrame({"x": [1, 2, 3]})
    assert_equivalent(df, "SELECT COUNT(*) AS cnt FROM t", t=t)


def test_rejects_wrong_counts(spark):
    df = spark.createDataFrame(pd.DataFrame({"cnt": [4]}))
    t = pd.DataFrame({"x": [1, 2, 3]})
    with pytest.raises(AssertionError):
        assert_equivalent(df, "SELECT COUNT(*) AS cnt FROM t", t=t)


def test_rejects_column_mismatch(spark):
    df = spark.createDataFrame(pd.DataFrame({"n": [3]}))
    t = pd.DataFrame({"x": [1]})
    with pytest.raises(AssertionError, match="column mismatch"):
        assert_equivalent(df, "SELECT COUNT(*) AS cnt FROM t", t=t)


def test_spark_inputs_registered(spark):
    t = spark.createDataFrame(pd.DataFrame({"x": [1, 2]}))
    df = spark.createDataFrame(pd.DataFrame({"cnt": [2]}))
    assert_equivalent(df, "SELECT COUNT(*) AS cnt FROM t", t=t)
