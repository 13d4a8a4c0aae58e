"""Unit tests for the Sparklens reimplementation (§3.2)."""
import numpy as np
import pytest

from repro.cluster.allocation import StaticAllocation
from repro.cluster.simulator import simulate
from repro.cluster.sparklens import SparklensReport, analyze
from repro.cluster.taskgraph import build_task_graph
from repro.core.features import PlanNode


def make_graph(fact_bytes=6_000_000, query="q"):
    fact = PlanNode("LogicalRelation", fact_bytes, 6, [])
    dim = PlanNode("LogicalRelation", 70_000, 4, [])
    join = PlanNode("Join", fact_bytes, 8, [fact, dim])
    agg = PlanNode("Aggregate", 100_000, 3, [join])
    sort = PlanNode("Sort", 100_000, 3, [agg])
    return build_task_graph(query, sort)


@pytest.fixture(scope="module")
def report():
    g = make_graph()
    run = simulate(g, StaticAllocation(16), seed=3)
    return analyze(run, observed_n=16), g, run


class TestSparklens:
    def test_monotone_nonincreasing(self, report):
        """§3.1 reason 3: Sparklens estimates never increase with n."""
        rep, _, _ = report
        est = [rep.estimate(n) for n in range(1, 49)]
        assert all(a >= b for a, b in zip(est, est[1:]))

    def test_saturates(self, report):
        rep, _, _ = report
        assert rep.estimate(1000) == pytest.approx(rep.estimate(10_000))

    def test_estimate_at_observed_n_close_to_actual(self, report):
        rep, _, run = report
        assert rep.estimate(16) == pytest.approx(run.elapsed, rel=0.35)

    def test_estimates_dict(self, report):
        rep, _, _ = report
        d = rep.estimates([1, 3, 8])
        assert set(d) == {1, 3, 8}
        assert d[1] >= d[8]

    def test_cross_n_estimates_track_simulation(self):
        """Estimates from an n=16 run track the simulated t(n) shape."""
        g = make_graph(8_000_000)
        rep = analyze(simulate(g, StaticAllocation(16), seed=5), observed_n=16)
        for n in (3, 8, 32):
            actual = np.mean(
                [simulate(g, StaticAllocation(n), seed=s).elapsed for s in range(3)]
            )
            assert rep.estimate(n) == pytest.approx(actual, rel=0.5)

    def test_driver_time_positive(self, report):
        rep, g, _ = report
        assert rep.driver_time > 0
        # must be in the ballpark of startup + per-stage overheads
        assert rep.driver_time < 3 * g.serial_time

    def test_deterministic(self):
        g = make_graph()
        r1 = analyze(simulate(g, StaticAllocation(16), seed=9), observed_n=16)
        r2 = analyze(simulate(g, StaticAllocation(16), seed=9), observed_n=16)
        assert r1.estimate(4) == r2.estimate(4)

    def test_concurrent_stages_grouped(self):
        """Two scans that overlapped must share a concurrency cluster."""
        g = make_graph()
        run = simulate(g, StaticAllocation(16), seed=1)
        rep = analyze(run, observed_n=16)
        assert len(rep.cluster_work) < len(
            [l for l in run.stage_logs if l.task_durations]
        )

    def test_report_fields(self, report):
        rep, _, _ = report
        assert isinstance(rep, SparklensReport)
        assert rep.observed_n == 16
        assert rep.e_c == 4
        for total, crit in rep.cluster_work:
            assert total >= crit > 0
