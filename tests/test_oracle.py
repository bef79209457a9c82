"""Sanity tests for the DuckDB result-equality oracle itself.

The oracle must accept matching results regardless of row/column order
and reject wrong values, missing rows, and misaligned column names —
otherwise every "vs oracle" test in the suite proves nothing.
"""
import pandas as pd
import pytest

from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def df(spark):
    return spark.createDataFrame(
        pd.DataFrame({"k": [1, 2, 3], "v": [10.0, 20.0, 30.0]})
    )


def test_accepts_equal(df):
    t = pd.DataFrame({"k": [1, 2, 3], "v": [10.0, 20.0, 30.0]})
    assert_equivalent(df, "SELECT k, v FROM t", t=t)


def test_accepts_any_row_order(df):
    t = pd.DataFrame({"k": [3, 1, 2], "v": [30.0, 10.0, 20.0]})
    assert_equivalent(df, "SELECT k, v FROM t", t=t)


def test_accepts_any_column_order(df):
    t = pd.DataFrame({"k": [1, 2, 3], "v": [10.0, 20.0, 30.0]})
    assert_equivalent(df, "SELECT v, k FROM t", t=t)


def test_rejects_wrong_value(df):
    t = pd.DataFrame({"k": [1, 2, 3], "v": [10.0, 20.0, 31.0]})
    with pytest.raises(AssertionError):
        assert_equivalent(df, "SELECT k, v FROM t", t=t)


def test_rejects_missing_row(df):
    t = pd.DataFrame({"k": [1, 2], "v": [10.0, 20.0]})
    with pytest.raises(AssertionError):
        assert_equivalent(df, "SELECT k, v FROM t", t=t)


def test_rejects_column_mismatch(df):
    t = pd.DataFrame({"k": [1, 2, 3], "v": [10.0, 20.0, 30.0]})
    with pytest.raises(AssertionError):
        assert_equivalent(df, "SELECT k, v AS other FROM t", t=t)


def test_accepts_spark_table_input(spark, df):
    assert_equivalent(df, "SELECT k, v FROM t", t=df)


def test_float_rounding_tolerance(spark):
    got = spark.createDataFrame(pd.DataFrame({"x": [0.1234567891]}))
    t = pd.DataFrame({"x": [0.1234567188]})  # equal after round(6)
    assert_equivalent(got, "SELECT x FROM t", t=t)
