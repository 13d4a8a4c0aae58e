"""Tests for the workload telemetry table (§4.1)."""
import pytest

from repro.core.features import FEATURE_NAMES
from repro.core.telemetry import workload_table
from repro.core.training import QueryRecord


@pytest.fixture(scope="module")
def records():
    ns = [1, 3, 8]
    return [
        QueryRecord(
            name=f"q{i}",
            features=[float(i)] * len(FEATURE_NAMES),
            actual_times={n: 100.0 / n + i for n in ns},
            sparklens_times={n: 95.0 / n + i for n in ns},
        )
        for i in range(4)
    ]


def test_one_row_per_query(spark, records):
    df = workload_table(spark, records)
    assert df.count() == 4  # §4.1: "one row per query"


def test_feature_columns_present(spark, records):
    df = workload_table(spark, records)
    for name in FEATURE_NAMES:
        assert name in df.columns


def test_time_columns_present(spark, records):
    df = workload_table(spark, records)
    for n in (1, 3, 8):
        assert f"t_actual_{n}" in df.columns
        assert f"t_sparklens_{n}" in df.columns


def test_queryable_with_spark_sql(spark, records):
    workload_table(spark, records).createOrReplaceTempView("workload")
    row = spark.sql(
        "SELECT COUNT(*) AS c FROM workload WHERE t_actual_1 > t_actual_8"
    ).first()
    assert row.c == 4


def test_empty_records_rejected(spark):
    with pytest.raises(ValueError):
        workload_table(spark, [])
