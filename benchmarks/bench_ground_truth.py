"""Benchmark: Fig 1 / Fig 3c — ground-truth t(n) generation (§5.1)."""
from repro.experiments.common import ground_truth_times
from repro.experiments.exp_ground_truth import (
    optimal_executor_distribution,
    tradeoff_curve,
)


def test_bench_ground_truth_one_query(benchmark, ds100):
    """Averaged t(n) over the §5.1 grid with repeats + IQR discard."""
    graph = ds100.graph("t7_ss_star_2000")
    times = benchmark(ground_truth_times, graph, runs=5)
    assert times[1] > times[48]


def test_bench_tradeoff_curve(benchmark, ds100):
    curve = benchmark(tradeoff_curve, ds100, "t7_ss_star_2000")
    assert curve[48]["auc"] > curve[1]["auc"] * 0.5


def test_bench_optimal_distribution(benchmark, ds100):
    dist = benchmark(optimal_executor_distribution, ds100)
    assert sum(dist.values()) == 103
