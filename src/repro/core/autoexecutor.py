"""AutoExecutor: the predictive optimizer rule end-to-end (§4).

The paper injects a rule into the Spark (JVM) optimizer that, after plan
optimization and before execution: loads a cached ONNX model, featurizes
the optimized plan, scores the parameter model once, evaluates the
predicted PPM over candidate executor counts, picks the operating point,
and requests executors. A true JVM ``Rule[LogicalPlan]`` requires
compiled Scala, which is out of scope here (DESIGN.md); this module
implements the same control flow in Python at the same lifecycle point —
operating on the **real Catalyst optimized plan** via py4j, with the
portable-model registry standing in for ONNX + AML (§4.3–4.4).

Per-step timings are recorded so §5.6's overhead table can be reproduced.
"""
from __future__ import annotations

import time
from dataclasses import dataclass, field

from pyspark.sql import DataFrame

from repro.core import ppm as ppm_mod
from repro.core.features import FEATURE_NAMES, featurize_plan
from repro.core.parameter_model import ParameterModel, TrainingExample
from repro.core.selection import elbow_point, factorize_cores, limited_slowdown
from repro.ml.portable import ModelRegistry, PortableModel


@dataclass
class Prediction:
    """Outcome of one AutoExecutor rule invocation."""

    query: str
    params: list[float]
    ppm: ppm_mod.PPM
    times: dict[int, float]  # predicted t(n) over candidates
    n_selected: int
    factorization: tuple[int, int] | None  # (n, e_c) for k = n * e_c_default
    timings_ms: dict[str, float] = field(default_factory=dict)


def train_and_register(
    registry: ModelRegistry,
    name: str,
    family: str,
    examples: list[TrainingExample],
    *,
    n_jobs: int = 1,
    random_state: int = 0,
) -> int:
    """Offline training (§4.2) + export to the model registry (§4.3).

    Returns the serialized model size in bytes (cf. §5.6's ~1 MB ONNX).
    """
    model = ParameterModel(
        family=family, random_state=random_state, n_jobs=n_jobs
    ).fit(examples)
    return registry.register(
        name,
        model.forest,
        feature_names=list(model.feature_names),
        target_names=list(model.target_names),
    )


@dataclass
class AutoExecutorRule:
    """The optimizer rule: predict-then-request, invoked once per query.

    ``strategy`` is either ``("slowdown", H)`` — smallest n within a
    slowdown threshold H of the predicted minimum — or ``("elbow",)`` —
    the §4.4 default that picks the point "right before the performance
    flattens".
    """

    registry: ModelRegistry
    model_name: str
    family: str
    candidates: tuple[int, ...] = tuple(range(1, 49))
    strategy: tuple = ("slowdown", 1.05)

    def _load(self) -> PortableModel:
        # load-once semantics: the registry caches after the first call
        return self.registry.get(self.model_name)

    def select(self, times: dict[int, float]) -> int:
        if self.strategy[0] == "slowdown":
            return limited_slowdown(times, self.strategy[1])
        if self.strategy[0] == "elbow":
            return elbow_point(times)
        raise ValueError(f"unknown strategy {self.strategy}")

    def apply(self, df: DataFrame, *, query_name: str = "?") -> Prediction:
        """Run the rule on an (already optimized) DataFrame plan."""
        timings: dict[str, float] = {}

        t0 = time.perf_counter()
        model = self._load()
        timings["model_load_ms"] = (time.perf_counter() - t0) * 1e3

        t0 = time.perf_counter()
        feats = featurize_plan(df)
        vector = feats.as_vector()
        timings["featurize_ms"] = (time.perf_counter() - t0) * 1e3

        t0 = time.perf_counter()
        params = model.predict(vector)[0]
        timings["inference_ms"] = (time.perf_counter() - t0) * 1e3

        t0 = time.perf_counter()
        ppm = ppm_mod.from_params(self.family, params)
        times = {int(n): float(ppm.time(int(n))) for n in self.candidates}
        n_sel = self.select(times)
        timings["selection_ms"] = (time.perf_counter() - t0) * 1e3

        return Prediction(
            query=query_name,
            params=[float(p) for p in params],
            ppm=ppm,
            times=times,
            n_selected=n_sel,
            factorization=factorize_cores(n_sel * 4),
            timings_ms=timings,
        )

    def predict_from_features(self, vector, *, query_name: str = "?") -> Prediction:
        """Rule body for pre-extracted features (simulation-side path)."""
        model = self._load()
        params = model.predict(list(vector))[0]
        ppm = ppm_mod.from_params(self.family, params)
        times = {int(n): float(ppm.time(int(n))) for n in self.candidates}
        n_sel = self.select(times)
        return Prediction(
            query=query_name,
            params=[float(p) for p in params],
            ppm=ppm,
            times=times,
            n_selected=n_sel,
            factorization=factorize_cores(n_sel * 4),
        )


assert len(FEATURE_NAMES) == 19, "Table-2 featurizer drifted from 19 features"
