"""Oracle + verify helper behavior (the checker must actually catch
wrong results, not just run)."""
import pandas as pd
import pytest

from repro.oracle import assert_equivalent


def test_oracle_accepts_equal(spark):
    pdf = pd.DataFrame({"k": [1, 2], "v": [1.0, 2.0]})
    df = spark.createDataFrame(pdf)
    assert_equivalent(df, "SELECT k, v FROM t", t=pdf)


def test_oracle_rejects_wrong_rows(spark):
    pdf = pd.DataFrame({"k": [1, 2], "v": [1.0, 2.0]})
    df = spark.createDataFrame(pd.DataFrame({"k": [1, 2], "v": [1.0, 99.0]}))
    with pytest.raises(AssertionError):
        assert_equivalent(df, "SELECT k, v FROM t", t=pdf)


def test_oracle_rejects_missing_column(spark):
    pdf = pd.DataFrame({"k": [1]})
    df = spark.createDataFrame(pd.DataFrame({"other": [1]}))
    with pytest.raises(AssertionError):
        assert_equivalent(df, "SELECT k FROM t", t=pdf)


def test_oracle_ignores_row_and_column_order(spark):
    pdf = pd.DataFrame({"k": [1, 2], "v": [1.0, 2.0]})
    df = spark.createDataFrame(pd.DataFrame({"v": [2.0, 1.0], "k": [2, 1]}))
    assert_equivalent(df, "SELECT k, v FROM t", t=pdf)


def test_oracle_accepts_spark_inputs(spark):
    pdf = pd.DataFrame({"k": [1, 2], "v": [1.0, 2.0]})
    sdf = spark.createDataFrame(pdf)
    assert_equivalent(sdf, "SELECT k, v FROM t", t=sdf)
