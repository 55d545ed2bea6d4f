"""The oracle itself must fail loudly on wrong results."""
import pandas as pd
import pytest

from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def t(spark):
    return spark.createDataFrame(pd.DataFrame({"k": [1, 2, 3], "v": [10.0, 20.0, 30.0]}))


def test_oracle_accepts_equal_results(t):
    assert_equivalent(t, "SELECT k, v FROM t", t=t)


def test_oracle_ignores_row_and_column_order(spark, t):
    reordered = spark.createDataFrame(
        pd.DataFrame({"v": [30.0, 10.0, 20.0], "k": [3, 1, 2]})
    )
    assert_equivalent(reordered, "SELECT k, v FROM t", t=t)


def test_oracle_detects_wrong_values(t):
    with pytest.raises(AssertionError):
        assert_equivalent(t, "SELECT k, v + 1 AS v FROM t", t=t)


def test_oracle_detects_missing_rows(t):
    with pytest.raises(AssertionError):
        assert_equivalent(t, "SELECT k, v FROM t WHERE k < 3", t=t)


def test_oracle_detects_column_mismatch(t):
    with pytest.raises(AssertionError, match="column mismatch"):
        assert_equivalent(t, "SELECT k AS key, v FROM t", t=t)


def test_oracle_accepts_pandas_inputs(t):
    pdf = pd.DataFrame({"k": [1, 2, 3], "v": [10.0, 20.0, 30.0]})
    assert_equivalent(t, "SELECT k, v FROM src", src=pdf)


def test_oracle_rounds_floats(spark):
    a = spark.createDataFrame(pd.DataFrame({"x": [0.1 + 0.2]}))
    assert_equivalent(a, "SELECT 0.3::DOUBLE AS x")
