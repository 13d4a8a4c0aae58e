"""Benchmark: Table 1 / Fig 5c — the e_c-vs-k config grid (§3.3)."""
from repro.experiments import exp_core_impact


def test_bench_config_grid(benchmark, ds100):
    """Simulate all 13 Table-1 configurations for a 20-query slice."""
    from repro.experiments.common import Dataset

    slice_ds = Dataset(
        sf=ds100.sf, records=ds100.records[:20], skeletons=ds100.skeletons
    )
    grid = benchmark(exp_core_impact.run_config_grid, slice_ds, runs=2)
    errs = exp_core_impact.relative_errors(grid)
    s = exp_core_impact.summarize(errs)
    assert s["points"] == 6 * 20
    assert s["mean_abs_pct"] < 20


def test_bench_full_grid_summary(benchmark, ds100):
    """End-to-end Table-1 statistic over all 103 queries (single runs)."""

    def run():
        grid = exp_core_impact.run_config_grid(ds100, runs=1)
        return exp_core_impact.summarize(exp_core_impact.relative_errors(grid))

    s = benchmark.pedantic(run, rounds=1, iterations=1)
    assert s["within_20_pct"] > 80
