"""Benchmark: Fig 12/13 — the DA vs SA vs Rule policy comparison (§5.4)."""
from repro.cluster.allocation import (
    DynamicAllocation,
    PredictiveRule,
    StaticAllocation,
)
from repro.cluster.simulator import simulate


def test_bench_three_policies_per_query(benchmark, ds100):
    """One query under all three §5.4 policies (the per-query unit)."""
    graph = ds100.graph("t7_ss_star_2000")

    def run():
        return (
            simulate(graph, DynamicAllocation(1, 48), seed=0),
            simulate(graph, StaticAllocation(48), seed=0),
            simulate(graph, PredictiveRule(n_predicted=20), seed=0),
        )

    da, sa, rule = benchmark(run)
    assert rule.auc < sa.auc
    assert sa.elapsed <= da.elapsed


def test_bench_workload_policy_sweep(benchmark, ds100):
    """All 103 queries under the three policies — the full Fig 13 sweep."""

    def sweep():
        total = {"da": 0.0, "sa": 0.0, "rule": 0.0}
        for rec in ds100.records:
            g = ds100.graph(rec.name)
            total["da"] += simulate(g, DynamicAllocation(1, 48), seed=1).auc
            total["sa"] += simulate(g, StaticAllocation(48), seed=1).auc
            total["rule"] += simulate(g, PredictiveRule(n_predicted=16), seed=1).auc
        return total

    total = benchmark.pedantic(sweep, rounds=1, iterations=1)
    assert total["rule"] < total["da"] < total["sa"]
