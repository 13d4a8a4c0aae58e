"""Tests for the DuckDB oracle itself: it must catch wrong results."""
import pandas as pd
import pytest

from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def tiny(spark):
    pdf = pd.DataFrame({"k": [1, 1, 2, 3], "v": [10.0, 20.0, 30.0, 40.0]})
    return spark.createDataFrame(pdf), pdf


def test_accepts_correct_result(spark, tiny):
    df, pdf = tiny
    df.createOrReplaceTempView("t")
    out = spark.sql("SELECT k, SUM(v) AS s FROM t GROUP BY k")
    assert_equivalent(out, "SELECT k, SUM(v) AS s FROM t GROUP BY k", t=pdf)


def test_detects_wrong_aggregation(spark, tiny):
    df, pdf = tiny
    df.createOrReplaceTempView("t")
    wrong = spark.sql("SELECT k, SUM(v) + 1 AS s FROM t GROUP BY k")
    with pytest.raises(AssertionError):
        assert_equivalent(wrong, "SELECT k, SUM(v) AS s FROM t GROUP BY k", t=pdf)


def test_detects_missing_rows(spark, tiny):
    df, pdf = tiny
    df.createOrReplaceTempView("t")
    wrong = spark.sql("SELECT k, SUM(v) AS s FROM t WHERE k <> 2 GROUP BY k")
    with pytest.raises(AssertionError):
        assert_equivalent(wrong, "SELECT k, SUM(v) AS s FROM t GROUP BY k", t=pdf)


def test_detects_column_mismatch(spark, tiny):
    df, pdf = tiny
    df.createOrReplaceTempView("t")
    wrong = spark.sql("SELECT k, SUM(v) AS wrong_name FROM t GROUP BY k")
    with pytest.raises(AssertionError, match="column mismatch"):
        assert_equivalent(wrong, "SELECT k, SUM(v) AS s FROM t GROUP BY k", t=pdf)


def test_row_order_irrelevant(spark, tiny):
    df, pdf = tiny
    df.createOrReplaceTempView("t")
    out = spark.sql("SELECT k, SUM(v) AS s FROM t GROUP BY k ORDER BY s DESC")
    assert_equivalent(out, "SELECT k, SUM(v) AS s FROM t GROUP BY k ORDER BY k", t=pdf)


def test_accepts_spark_dataframe_inputs(spark, tiny):
    df, _ = tiny
    df.createOrReplaceTempView("t")
    out = spark.sql("SELECT COUNT(*) AS c FROM t")
    assert_equivalent(out, "SELECT COUNT(*) AS c FROM t", t=df)
