"""Benchmark: the §5.6 overhead table, measured with pytest-benchmark.

Each benchmark mirrors one §5.6 number; the assertions only check the
operation worked — the measured wall-times land in bench_output.txt and
EXPERIMENTS.md next to the paper's figures.
"""
import numpy as np
import pytest

from repro.core import ppm as ppm_mod
from repro.core.parameter_model import ParameterModel
from repro.ml.portable import ModelRegistry, load_model, save_model
from repro.workloads.tpcds_lite import QUERIES


@pytest.fixture(scope="module")
def examples(ds100):
    return [r.to_example() for r in ds100.records]


@pytest.fixture(scope="module")
def fitted(examples):
    return ParameterModel(family="AE_PL", random_state=0, n_jobs=8).fit(examples)


def test_bench_ppm_param_fit(benchmark, examples):
    """Paper: ~0.3 ms per training data point."""
    ex = examples[0]
    ns = sorted(ex.times)
    ts = [ex.times[n] for n in ns]
    model = benchmark(ppm_mod.fit, "AE_PL", ns, ts)
    assert model.time(1) >= model.time(48)


def test_bench_rf_training(benchmark, examples):
    """Paper: ~79 ms for 103 queries (sklearn C; ours is pure python)."""
    model = benchmark.pedantic(
        lambda: ParameterModel(family="AE_PL", random_state=0, n_jobs=8).fit(examples),
        rounds=3,
        iterations=1,
    )
    assert model.forest is not None


def test_bench_model_scoring(benchmark, fitted, ds100):
    """Paper: ~3.6 ms per scikit-learn scoring call."""
    feats = ds100.records[0].features
    params = benchmark(fitted.predict_params, feats)
    assert len(params) == 3


def test_bench_portable_save(benchmark, fitted, tmp_path):
    """Paper: ~1 MB ONNX file."""
    path = str(tmp_path / "m.repromodel")
    size = benchmark(
        save_model,
        path,
        fitted.forest,
        feature_names=list(fitted.feature_names),
        target_names=list(fitted.target_names),
    )
    assert 10_000 < size < 5_000_000


def test_bench_portable_load(benchmark, fitted, tmp_path):
    """Paper: ~88 + 47 ms one-time ONNX load/setup."""
    path = str(tmp_path / "m.repromodel")
    save_model(
        path,
        fitted.forest,
        feature_names=list(fitted.feature_names),
        target_names=list(fitted.target_names),
    )
    model = benchmark(load_model, path)
    assert model.feature_names == list(fitted.feature_names)


def test_bench_registry_cached_get(benchmark, fitted, tmp_path):
    """Load-once cache: warm gets must be near-free (§4.4)."""
    reg = ModelRegistry(str(tmp_path))
    reg.register(
        "m",
        fitted.forest,
        feature_names=list(fitted.feature_names),
        target_names=list(fitted.target_names),
    )
    reg.get("m")  # warm
    model = benchmark(reg.get, "m")
    assert model is reg.get("m")


def test_bench_inference(benchmark, fitted, ds100, tmp_path):
    """Paper: ~0.9 ms ONNX inference per query."""
    path = str(tmp_path / "m.repromodel")
    save_model(
        path,
        fitted.forest,
        feature_names=list(fitted.feature_names),
        target_names=list(fitted.target_names),
    )
    pm = load_model(path)
    feats = np.asarray(ds100.records[0].features)
    out = benchmark(pm.predict, feats)
    assert out.shape == (1, 3)


def test_bench_plan_featurization(benchmark, spark, tmp_path_factory):
    """Paper: ~10.3 ms plan featurization inside the optimizer."""
    from repro.core.features import featurize_plan
    from repro.workloads.tpcds_lite import materialize

    materialize(
        spark, sf=0.005, root=str(tmp_path_factory.mktemp("bench_feat"))
    )
    df = spark.sql(QUERIES[0].sql)
    feats = benchmark(featurize_plan, df)
    assert feats.values["input_bytes"] > 0
