"""Benchmark: Fig 10/11 — configuration selection over the workload."""
from repro.core.selection import elbow_point, interpolate_times, limited_slowdown


def test_bench_limited_slowdown_all_queries(benchmark, ds100):
    interp = {r.name: interpolate_times(r.actual_times) for r in ds100.records}

    def select():
        return {
            q: [limited_slowdown(t, h) for h in (1.0, 1.05, 1.1, 1.2, 1.5, 2.0)]
            for q, t in interp.items()
        }

    sels = benchmark(select)
    assert len(sels) == 103
    for per_h in sels.values():
        assert per_h == sorted(per_h, reverse=True)


def test_bench_elbow_all_queries(benchmark, ds100):
    interp = {r.name: interpolate_times(r.actual_times) for r in ds100.records}
    elbows = benchmark(lambda: {q: elbow_point(t) for q, t in interp.items()})
    # Fig 11: the vast majority of queries sit at L = 8
    at8 = sum(1 for l in elbows.values() if l == 8)
    assert at8 > 60
