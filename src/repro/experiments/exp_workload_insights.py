"""Experiment: production-workload insights, computed in Spark SQL
(Fig 2a–c, Fig 3a–b; §2.1–2.2).

The analyses run over the synthetic production trace
(:mod:`repro.workloads.production_trace`) as Spark DataFrame pipelines —
the same aggregations Peregrine-style telemetry analysis would do — and
reproduce the paper's headline percentages.
"""
from __future__ import annotations

import pyspark.sql.functions as F
from pyspark.sql import SparkSession

from repro.workloads.production_trace import MAX_INT32, TraceConfig, generate_trace


def compute_insights(spark: SparkSession, config: TraceConfig | None = None) -> dict[str, float]:
    apps, queries = generate_trace(spark, config)
    apps.cache()
    queries.cache()
    n_apps = apps.count()

    # Fig 2a: share of applications with more than one query
    multi = apps.filter(F.col("num_queries") > 1).count() / n_apps

    # Fig 2b: median within-app coefficient of variation (apps with >1 query)
    cov = (
        queries.groupBy("app_id")
        .agg(
            (F.stddev("num_operators") / F.mean("num_operators")).alias("cov_ops"),
            (F.stddev("input_rows") / F.mean("input_rows")).alias("cov_rows"),
            (F.stddev("exec_time_sec") / F.mean("exec_time_sec")).alias("cov_time"),
            F.count("*").alias("nq"),
        )
        .filter(F.col("nq") > 1)
    )
    med = cov.agg(
        F.expr("percentile_approx(cov_ops, 0.5)").alias("ops"),
        F.expr("percentile_approx(cov_rows, 0.5)").alias("rows"),
        F.expr("percentile_approx(cov_time, 0.5)").alias("time"),
    ).first()

    # Fig 2c: apps whose [start, end] interval overlaps no other app in the
    # same cluster (self-join on cluster, interval-overlap predicate)
    a = apps.alias("a")
    b = apps.alias("b")
    overlapping = (
        a.join(
            b,
            (F.col("a.cluster_id") == F.col("b.cluster_id"))
            & (F.col("a.app_id") != F.col("b.app_id"))
            & (F.col("a.start_time") < F.col("b.end_time"))
            & (F.col("b.start_time") < F.col("a.end_time")),
            "left_semi",
        )
        .select("a.app_id")
        .distinct()
        .count()
    )
    exclusive = 1.0 - overlapping / n_apps

    # §2.2 / Fig 3a-b: dynamic-allocation settings
    da_apps = apps.filter(F.col("dynamic_allocation"))
    n_da = da_apps.count()
    da_share = n_da / n_apps
    default_bounds = (
        da_apps.filter(
            (F.col("min_executors") == 0) & (F.col("max_executors") == MAX_INT32)
        ).count()
        / n_da
    )
    custom = da_apps.filter(F.col("max_executors") != MAX_INT32)
    n_custom = custom.count()
    range2 = (
        custom.filter(F.col("max_executors") - F.col("min_executors") <= 2).count()
        / n_custom
        if n_custom
        else 0.0
    )
    non_da = apps.filter(~F.col("dynamic_allocation"))
    static_default = non_da.filter(F.col("static_executors") == 2).count() / non_da.count()

    return {
        "multi_query_share": multi,
        "median_cov_ops": float(med["ops"]),
        "median_cov_rows": float(med["rows"]),
        "median_cov_time": float(med["time"]),
        "exclusive_cluster_share": exclusive,
        "da_share": da_share,
        "da_default_bounds_share": default_bounds,
        "da_custom_range2_share": range2,
        "static_default2_share": static_default,
    }


def format_report(spark: SparkSession) -> str:
    r = compute_insights(spark)
    return "\n".join(
        [
            "== Fig 2 / Fig 3a-b: production workload insights (synthetic trace) ==",
            f"apps with >1 query:            {r['multi_query_share']*100:5.1f}%  (paper: >60%)",
            f"median CoV operators:          {r['median_cov_ops']*100:5.1f}%  (paper: >=20%)",
            f"median CoV input rows:         {r['median_cov_rows']*100:5.1f}%  (paper: >=40%)",
            f"median CoV exec time:          {r['median_cov_time']*100:5.1f}%  (paper: >=60%)",
            f"apps not sharing cluster:      {r['exclusive_cluster_share']*100:5.1f}%  (paper: ~70%)",
            f"apps with dynamic allocation:  {r['da_share']*100:5.1f}%  (paper: 59%)",
            f"DA apps with default bounds:   {r['da_default_bounds_share']*100:5.1f}%  (paper: 97%)",
            f"custom-DA apps with range<=2:  {r['da_custom_range2_share']*100:5.1f}%  (paper: ~60%)",
            f"non-DA apps with default n=2:  {r['static_default2_share']*100:5.1f}%  (paper: 80%)",
        ]
    )
