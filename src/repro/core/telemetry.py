"""Workload telemetry table (Peregrine / SparkCruise substitute, §4.1).

The paper logs annotated plans and runtime metrics for every query and
transforms them into "a tabular representation of the query workload ...
one row per query". This module builds that table as a Spark DataFrame
from the reproduction's query records, so downstream analysis (training
-data assembly, workload insights) runs through Spark SQL.
"""
from __future__ import annotations

from pyspark.sql import DataFrame, SparkSession

from repro.core.features import FEATURE_NAMES
from repro.core.training import QueryRecord


def workload_table(spark: SparkSession, records: list[QueryRecord]) -> DataFrame:
    """One row per query: name + Table-2 features + per-n times.

    Time columns are ``t_actual_<n>`` and ``t_sparklens_<n>`` for each n
    in the record's grid.
    """
    if not records:
        raise ValueError("no records")
    ns = sorted(records[0].actual_times)
    rows = []
    for r in records:
        row = {"query": r.name}
        row.update({name: float(v) for name, v in zip(FEATURE_NAMES, r.features)})
        row.update({f"t_actual_{n}": float(r.actual_times[n]) for n in ns})
        row.update({f"t_sparklens_{n}": float(r.sparklens_times[n]) for n in ns})
        rows.append(row)
    return spark.createDataFrame(rows)
