"""Experiment: predictive vs static vs dynamic allocation (Fig 12/13, §5.4).

For every query, run the cluster simulator under three policies:

- ``DA(1,48)`` — Spark dynamic allocation restricted to [1, 48];
- ``SA(48)`` — static allocation of the full pool;
- ``Rule(n̂)`` — AutoExecutor: n̂ predicted by AE_PL with the H=1.05
  limited-slowdown objective from one set of 5-fold CV experiments
  (each query's n̂ comes from the fold where it was held out).

Reported per query and on average: ratios of max executors n, AUC
(executor occupancy), and run time t, DA/Rule and SA/Rule — the paper's
headline being 48 % AUC saved vs DA and 73 % vs SA with <5 % and ~16 %
slowdown respectively.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np

from repro.cluster.allocation import (
    DynamicAllocation,
    PredictiveRule,
    StaticAllocation,
)
from repro.cluster.simulator import RunResult, simulate
from repro.core.selection import limited_slowdown
from repro.experiments.common import Dataset, run_cv_cached, stable_seed

FULL_RANGE = tuple(range(1, 49))


def rule_predictions(ds: Dataset, *, h: float = 1.05, repeat: int = 0) -> dict[str, int]:
    """query → n̂ from the AE_PL CV folds of one repeat (held-out)."""
    folds = [fr for fr in run_cv_cached(ds, family="AE_PL") if fr.repeat == repeat]
    out: dict[str, int] = {}
    for fr in folds:
        for q, model in fr.predicted.items():
            out[q] = limited_slowdown({n: model.time(n) for n in FULL_RANGE}, h)
    return out


@dataclass
class PolicyComparison:
    """Per-query metrics for the three §5.4 policies."""

    query: str
    n_pred: int
    da: RunResult
    sa48: RunResult
    rule: RunResult
    fully_allocated: bool  # ran long enough for Rule's request to complete


def compare_policies(ds: Dataset, *, h: float = 1.05) -> list[PolicyComparison]:
    preds = rule_predictions(ds, h=h)
    out = []
    for rec in ds.records:
        graph = ds.graph(rec.name)
        n_pred = preds[rec.name]
        da = simulate(
            graph, DynamicAllocation(1, 48), seed=stable_seed(rec.name, "da")
        )
        sa = simulate(
            graph, StaticAllocation(48), seed=stable_seed(rec.name, "sa48")
        )
        rule = simulate(
            graph,
            PredictiveRule(n_predicted=n_pred),
            seed=stable_seed(rec.name, "rule"),
        )
        out.append(
            PolicyComparison(
                query=rec.name,
                n_pred=n_pred,
                da=da,
                sa48=sa,
                rule=rule,
                fully_allocated=rule.max_executors >= max(n_pred, 5),
            )
        )
    return out


def summarize(comps: list[PolicyComparison]) -> dict[str, float]:
    """The §5.4 aggregate numbers."""

    def ratios(metric):
        da = [metric(c.da) / metric(c.rule) for c in comps]
        sa = [metric(c.sa48) / metric(c.rule) for c in comps]
        return float(np.mean(da)), float(np.mean(sa))

    n_da, n_sa = ratios(lambda r: max(r.max_executors, 1))
    auc_da, auc_sa = ratios(lambda r: max(r.auc, 1e-9))
    t_da = [c.da.elapsed / c.rule.elapsed for c in comps]
    t_sa = [c.sa48.elapsed / c.rule.elapsed for c in comps]
    total_auc = {
        "rule": sum(c.rule.auc for c in comps),
        "da": sum(c.da.auc for c in comps),
        "sa48": sum(c.sa48.auc for c in comps),
    }
    return {
        "n_ratio_da": n_da,
        "n_ratio_sa48": n_sa,
        "auc_ratio_da": auc_da,
        "auc_ratio_sa48": auc_sa,
        "speedup_vs_da": float(np.mean(t_da)),
        "speedup_vs_sa48": float(np.mean(t_sa)),
        "auc_saved_vs_da_pct": 100.0 * (1 - total_auc["rule"] / total_auc["da"]),
        "auc_saved_vs_sa48_pct": 100.0 * (1 - total_auc["rule"] / total_auc["sa48"]),
        "slowdown_vs_da_pct": 100.0 * (np.mean([1 / x for x in t_da]) - 1),
        "slowdown_vs_sa48_pct": 100.0 * (np.mean([1 / x for x in t_sa]) - 1),
        "fully_allocated": sum(c.fully_allocated for c in comps),
        "queries": len(comps),
    }


def skyline_example(ds: Dataset, query: str, *, n_pred: int | None = None) -> dict:
    """Fig 12: skylines for DA(1,48), SA(48), SA(n̂), Rule(n̂) for one query."""
    graph = ds.graph(query)
    n_pred = n_pred or rule_predictions(ds)[query]
    runs = {
        "DA(1,48)": simulate(graph, DynamicAllocation(1, 48), seed=stable_seed(query, "f12da")),
        "SA(48)": simulate(graph, StaticAllocation(48), seed=stable_seed(query, "f12sa")),
        f"SA({n_pred})": simulate(graph, StaticAllocation(n_pred), seed=stable_seed(query, "f12san")),
        f"Rule({n_pred})": simulate(
            graph, PredictiveRule(n_predicted=n_pred), seed=stable_seed(query, "f12rule")
        ),
    }
    return {
        name: {
            "t": r.elapsed,
            "max_n": r.max_executors,
            "auc": r.auc,
            "skyline": r.skyline,
        }
        for name, r in runs.items()
    }


def format_report(ds: Dataset) -> str:
    comps = compare_policies(ds)
    s = summarize(comps)
    lines = [
        "== Fig 13 / §5.4: DA(1,48) and SA(48) vs Rule (AE_PL, H=1.05) ==",
        f"avg n ratio:    DA/Rule={s['n_ratio_da']:.1f}  SA48/Rule={s['n_ratio_sa48']:.1f}",
        f"avg AUC ratio:  DA/Rule={s['auc_ratio_da']:.1f}  SA48/Rule={s['auc_ratio_sa48']:.1f}",
        f"AUC saved:      vs DA={s['auc_saved_vs_da_pct']:.0f}%  vs SA48={s['auc_saved_vs_sa48_pct']:.0f}%",
        f"Rule slowdown:  vs DA={s['slowdown_vs_da_pct']:.0f}%  vs SA48={s['slowdown_vs_sa48_pct']:.0f}%",
        f"fully-allocated queries: {s['fully_allocated']}/{s['queries']}",
    ]
    ex = skyline_example(ds, "t7_ss_star_2000")
    lines.append("")
    lines.append("== Fig 12: example skylines (t7_ss_star_2000, q94 analogue) ==")
    for name, r in ex.items():
        lines.append(f"{name:<10} t={r['t']:6.0f}s  max_n={r['max_n']:>2}  AUC={r['auc']:7.0f}")
    return "\n".join(lines)
