"""Sparklens reimplementation (Qubole Sparklens v0.3.2 substitute, §3.2).

Sparklens replays the task-level event log of *one* completed run and
estimates what the application time would have been with a different
executor count, by simulating the scheduler: the critical path lower-
bounds each part of the execution, and the remaining task work is spread
perfectly over the ``n·e_c`` available cores.

This reimplementation keeps the observed concurrency structure: stages
whose activity intervals overlapped in the analysed run are grouped into
a concurrency cluster, and each cluster contributes

    max(longest_task_in_cluster, cluster_total_task_time / (n · e_c))

with the driver time (periods with no task running: app startup,
inter-stage driver work, teardown) added once. Estimates are
deterministic and monotonically non-increasing in ``n`` — the property
§3.1 explicitly relies on (reason 3).
"""
from __future__ import annotations

from dataclasses import dataclass

from repro.cluster.simulator import RunResult


@dataclass
class SparklensReport:
    """Post-hoc analysis of one run: estimates for candidate counts."""

    query: str
    observed_n: int
    driver_time: float
    # one entry per concurrency cluster: (total_task_time, critical_task)
    cluster_work: list[tuple[float, float]]
    e_c: int

    def estimate(self, n: int) -> float:
        """Estimated application time with ``n`` executors."""
        cores = max(1, n * self.e_c)
        return self.driver_time + sum(
            max(crit, total / cores) for total, crit in self.cluster_work
        )

    def estimates(self, ns) -> dict[int, float]:
        return {int(n): self.estimate(int(n)) for n in ns}


def _merge_intervals(spans: list[tuple[float, float, int]]):
    """Group stage indices whose [start, end) intervals overlap."""
    spans = sorted(spans)
    groups: list[list[int]] = []
    cur_end = None
    for s, e, idx in spans:
        if cur_end is None or s > cur_end:
            groups.append([idx])
            cur_end = e
        else:
            groups[-1].append(idx)
            cur_end = max(cur_end, e)
    return groups


def analyze(run: RunResult, *, observed_n: int) -> SparklensReport:
    """Build a report from a completed run's task logs."""
    logs = [l for l in run.stage_logs if l.task_durations]
    spans = [(l.start, l.end, i) for i, l in enumerate(logs) if l.end > l.start]
    groups = _merge_intervals(spans)
    grouped = {i for g in groups for i in g}
    # zero-span stages (instantaneous) each form their own cluster
    for i, l in enumerate(logs):
        if i not in grouped:
            groups.append([i])
    cluster_work = [
        (
            float(sum(sum(logs[i].task_durations) for i in g)),
            float(max(max(logs[i].task_durations) for i in g)),
        )
        for g in groups
    ]
    busy = 0.0
    cur_start = cur_end = None
    for s, e, _ in sorted(spans):
        if cur_end is None or s > cur_end:
            if cur_end is not None:
                busy += cur_end - cur_start
            cur_start, cur_end = s, e
        else:
            cur_end = max(cur_end, e)
    if cur_end is not None:
        busy += cur_end - cur_start
    driver = max(0.0, run.elapsed - busy)
    return SparklensReport(
        query=run.query,
        observed_n=observed_n,
        driver_time=driver,
        cluster_work=cluster_work,
        e_c=run.e_c,
    )
