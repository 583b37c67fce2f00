"""The DuckDB oracle itself must catch wrong results, not just pass."""
import pandas as pd
import pytest

from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def df(spark):
    return spark.createDataFrame([(1, "a"), (2, "b")], "x: long, y: string")


def test_oracle_accepts_equal(df):
    assert_equivalent(df, "SELECT x, y FROM t", t=pd.DataFrame({"x": [1, 2], "y": ["a", "b"]}))


def test_oracle_ignores_row_and_column_order(df):
    assert_equivalent(df, "SELECT y, x FROM t ORDER BY x DESC", t=pd.DataFrame({"x": [2, 1], "y": ["b", "a"]}))


def test_oracle_rejects_wrong_values(df):
    with pytest.raises(AssertionError):
        assert_equivalent(df, "SELECT x + 1 AS x, y FROM t", t=pd.DataFrame({"x": [1, 2], "y": ["a", "b"]}))


def test_oracle_rejects_column_mismatch(df):
    with pytest.raises(AssertionError, match="column mismatch"):
        assert_equivalent(df, "SELECT x AS z, y FROM t", t=pd.DataFrame({"x": [1, 2], "y": ["a", "b"]}))


def test_oracle_rejects_missing_rows(df):
    with pytest.raises(AssertionError):
        assert_equivalent(df, "SELECT x, y FROM t WHERE x = 1", t=pd.DataFrame({"x": [1, 2], "y": ["a", "b"]}))
