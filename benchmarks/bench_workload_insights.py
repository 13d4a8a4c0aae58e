"""Benchmark: Fig 2/3a-b — the Spark SQL workload-insight pipeline (§2)."""
from repro.experiments.exp_workload_insights import compute_insights
from repro.workloads.production_trace import TraceConfig


def test_bench_insights_pipeline(benchmark, spark):
    cfg = TraceConfig(n_apps=3000, n_clusters=120, seed=7)
    res = benchmark.pedantic(
        compute_insights, args=(spark, cfg), rounds=1, iterations=1
    )
    assert res["multi_query_share"] > 0.55
    assert 0.5 < res["da_share"] < 0.7
