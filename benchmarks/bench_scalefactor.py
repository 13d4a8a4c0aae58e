"""Benchmark: Fig 14 — cross-scale-factor training + evaluation (§5.5)."""
from repro.experiments import exp_scalefactor


def test_bench_cross_sf(benchmark, ds10, ds100):
    res = benchmark.pedantic(
        exp_scalefactor.cross_sf_errors, args=(ds10, ds100), rounds=1, iterations=1
    )
    # Fig 14b headline: a Sparklens estimate from the wrong SF is much
    # worse at small n than one from the right SF
    assert res["S_train"][1] > res["S_test"][1]
    # the model's data-size features recover much of that gap by n=48
    assert res["AE_PL"][48] < res["S_train"][1]
