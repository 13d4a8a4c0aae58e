"""Experiment: generalisation across input data sizes (Fig 14, §5.5).

Train the parameter model on *all* queries of one scale factor, test on
all queries of the other. Since the Table-2 features include the input
bytes/rows, the model can adjust predictions for the new data size —
whereas a Sparklens estimate obtained at the training SF knows nothing
about the change (the paper's S_10 vs S_100 comparison).
"""
from __future__ import annotations

from repro.core.parameter_model import ParameterModel
from repro.core.ppm import error_metric
from repro.core.training import N_GRID
from repro.experiments.common import Dataset


def cross_sf_errors(
    train_ds: Dataset, test_ds: Dataset, *, n_jobs: int = 8
) -> dict[str, dict[int, float]]:
    """E(n) on ``test_ds`` actuals for AE_PL/AE_AL trained on ``train_ds``,
    plus Sparklens references from both scale factors.
    """
    out: dict[str, dict[int, float]] = {}
    actual = {
        n: {r.name: r.actual_times[n] for r in test_ds.records} for n in N_GRID
    }
    for family in ("AE_PL", "AE_AL"):
        model = ParameterModel(family=family, random_state=0, n_jobs=n_jobs).fit(
            [r.to_example() for r in train_ds.records]
        )
        preds = {r.name: model.predict_ppm(r.features) for r in test_ds.records}
        out[family] = {
            n: error_metric(actual[n], {q: m.time(n) for q, m in preds.items()})
            for n in N_GRID
        }
    # Sparklens references: estimates from the test SF's own runs, and the
    # *training* SF's runs applied to the test SF's actual times.
    by_name_train = {r.name: r for r in train_ds.records}
    for label, source in (
        ("S_test", {r.name: r.sparklens_times for r in test_ds.records}),
        ("S_train", {r.name: by_name_train[r.name].sparklens_times for r in test_ds.records}),
    ):
        out[label] = {
            n: error_metric(actual[n], {q: times[n] for q, times in source.items()})
            for n in N_GRID
        }
    return out


def format_report(ds10: Dataset, ds100: Dataset) -> str:
    lines = []
    for train, test, tag in ((ds100, ds10, "test SF=10, train SF=100"),
                             (ds10, ds100, "test SF=100, train SF=10")):
        res = cross_sf_errors(train, test)
        lines.append(f"== Fig 14: {tag} ==")
        lines.append("series   " + "  ".join(f"{n:>6}" for n in N_GRID))
        for series in ("S_test", "S_train", "AE_PL", "AE_AL"):
            lines.append(
                f"{series:<8} " + "  ".join(f"{res[series][n]:6.3f}" for n in N_GRID)
            )
        lines.append("")
    return "\n".join(lines)
