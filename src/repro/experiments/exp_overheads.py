"""Experiment: training and scoring overheads (§5.6).

Measures the reproduction's analogues of every number in §5.6:

- per-point PPM parameter-fit time (paper ~0.3 ms),
- Random-Forest training time over all 103 queries (paper ~79 ms with
  sklearn's C implementation; ours is pure python),
- parameter-model scoring time (paper ~3.6 ms),
- plan featurization time inside the optimizer (paper ~10.3 ms; needs a
  SparkSession, measured in ``benchmarks/bench_overheads.py``),
- portable-model save size, one-time load/setup time, and per-query
  inference time (paper: ~1 MB ONNX, ~88/47 ms, ~0.9 ms).
"""
from __future__ import annotations

import tempfile
import time
from dataclasses import dataclass

from repro.core import ppm as ppm_mod
from repro.core.parameter_model import ParameterModel
from repro.experiments.common import Dataset
from repro.ml.portable import ModelRegistry


@dataclass
class Overheads:
    ppm_fit_ms_per_point: float
    rf_train_ms: float
    score_ms: float
    model_size_mb: float
    load_ms: float
    cached_get_ms: float
    inference_ms: float


def measure(ds: Dataset, *, family: str = "AE_PL", n_jobs: int = 1) -> Overheads:
    records = ds.records
    examples = [r.to_example() for r in records]

    t0 = time.perf_counter()
    for ex in examples:
        ns = sorted(ex.times)
        ppm_mod.fit(family, ns, [ex.times[n] for n in ns])
    fit_ms = (time.perf_counter() - t0) / len(examples) * 1e3

    t0 = time.perf_counter()
    model = ParameterModel(family=family, random_state=0, n_jobs=n_jobs).fit(examples)
    train_ms = (time.perf_counter() - t0) * 1e3

    feats = records[0].features
    model.predict_ppm(feats)  # warm
    t0 = time.perf_counter()
    for _ in range(20):
        model.predict_ppm(feats)
    score_ms = (time.perf_counter() - t0) / 20 * 1e3

    with tempfile.TemporaryDirectory() as tmp:
        reg = ModelRegistry(tmp)
        size = reg.register(
            "m",
            model.forest,
            feature_names=list(model.feature_names),
            target_names=list(model.target_names),
        )
        t0 = time.perf_counter()
        pm = reg.get("m")
        load_ms = (time.perf_counter() - t0) * 1e3
        t0 = time.perf_counter()
        for _ in range(50):
            reg.get("m")
        cached_ms = (time.perf_counter() - t0) / 50 * 1e3
        pm.predict(feats)  # warm
        t0 = time.perf_counter()
        for _ in range(20):
            pm.predict(feats)
        infer_ms = (time.perf_counter() - t0) / 20 * 1e3

    return Overheads(
        ppm_fit_ms_per_point=fit_ms,
        rf_train_ms=train_ms,
        score_ms=score_ms,
        model_size_mb=size / 1e6,
        load_ms=load_ms,
        cached_get_ms=cached_ms,
        inference_ms=infer_ms,
    )


def format_report(ds: Dataset) -> str:
    o = measure(ds)
    return "\n".join(
        [
            "== §5.6 overheads (ours vs paper) ==",
            f"PPM param fit / query:     {o.ppm_fit_ms_per_point:7.2f} ms   (paper ~0.3 ms)",
            f"RF training (103 queries): {o.rf_train_ms:7.0f} ms   (paper ~79 ms, sklearn C)",
            f"parameter-model scoring:   {o.score_ms:7.2f} ms   (paper ~3.6 ms)",
            f"portable model size:       {o.model_size_mb:7.2f} MB   (paper ~1 MB ONNX)",
            f"model load (cold):         {o.load_ms:7.1f} ms   (paper ~88+47 ms)",
            f"model get (cached):        {o.cached_get_ms:7.3f} ms   (load-once cache)",
            f"inference per query:       {o.inference_ms:7.2f} ms   (paper ~0.9 ms)",
        ]
    )
