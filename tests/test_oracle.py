"""The DuckDB oracle itself must catch wrong results, not just run."""
import pandas as pd
import pytest

from repro.oracle import assert_equivalent


def test_oracle_accepts_correct_result(spark):
    pdf = pd.DataFrame({"k": [1, 2, 2], "v": [1.0, 2.0, 3.0]})
    df = spark.createDataFrame(pdf)
    got = df.groupBy("k").sum("v").withColumnRenamed("sum(v)", "s")
    assert_equivalent(got, "SELECT k, SUM(v) AS s FROM t GROUP BY k", t=pdf)


def test_oracle_rejects_wrong_rows(spark):
    pdf = pd.DataFrame({"k": [1, 2], "v": [1.0, 2.0]})
    got = spark.createDataFrame(pd.DataFrame({"k": [1, 2], "s": [1.0, 99.0]}))
    with pytest.raises(AssertionError):
        assert_equivalent(got, "SELECT k, SUM(v) AS s FROM t GROUP BY k", t=pdf)


def test_oracle_rejects_column_mismatch(spark):
    pdf = pd.DataFrame({"k": [1]})
    got = spark.createDataFrame(pd.DataFrame({"wrong": [1]}))
    with pytest.raises(AssertionError, match="column mismatch"):
        assert_equivalent(got, "SELECT k FROM t", t=pdf)


def test_oracle_order_insensitive(spark):
    pdf = pd.DataFrame({"k": [3, 1, 2]})
    got = spark.createDataFrame(pd.DataFrame({"k": [2, 3, 1]}))
    assert_equivalent(got, "SELECT k FROM t", t=pdf)


def test_oracle_accepts_spark_inputs(spark):
    df = spark.createDataFrame(pd.DataFrame({"k": [1, 1, 2]}))
    got = df.distinct()
    assert_equivalent(got, "SELECT DISTINCT k FROM t", t=df)
