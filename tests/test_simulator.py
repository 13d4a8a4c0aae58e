"""Unit tests for the event-driven cluster simulator."""
import numpy as np
import pytest

from repro.cluster.allocation import (
    DynamicAllocation,
    PredictiveRule,
    StaticAllocation,
)
from repro.cluster.simulator import SimParams, core_efficiency, simulate
from repro.cluster.taskgraph import build_task_graph
from repro.core.features import PlanNode


def make_graph(fact_bytes=4_000_000, query="q"):
    fact = PlanNode("LogicalRelation", fact_bytes, 6, [])
    dim = PlanNode("LogicalRelation", 60_000, 4, [])
    join = PlanNode("Join", fact_bytes, 8, [fact, dim])
    agg = PlanNode("Aggregate", 100_000, 3, [join])
    return build_task_graph(query, agg)


@pytest.fixture(scope="module")
def graph():
    return make_graph()


class TestStaticAllocation:
    def test_monotone_nonincreasing_mean_times(self, graph):
        """t(n) decreases with n up to saturation (averaged over seeds)."""
        means = []
        for n in (1, 3, 8, 16, 48):
            ts = [simulate(graph, StaticAllocation(n), seed=s).elapsed for s in range(5)]
            means.append(np.mean(ts))
        assert all(a >= b * 0.97 for a, b in zip(means, means[1:]))

    def test_max_executors_matches_request(self, graph):
        r = simulate(graph, StaticAllocation(7), seed=0)
        assert r.max_executors == 7

    def test_deterministic_given_seed(self, graph):
        a = simulate(graph, StaticAllocation(8), seed=42)
        b = simulate(graph, StaticAllocation(8), seed=42)
        assert a.elapsed == b.elapsed
        assert a.auc == b.auc

    def test_seed_varies_runtime(self, graph):
        ts = {simulate(graph, StaticAllocation(8), seed=s).elapsed for s in range(6)}
        assert len(ts) > 1

    def test_run_to_run_cov_in_paper_band(self):
        """§5.1 reports ~4–7 % CoV; ours should be single-digit percent."""
        g = make_graph(8_000_000)
        ts = [simulate(g, StaticAllocation(8), seed=s).elapsed for s in range(12)]
        cov = np.std(ts) / np.mean(ts)
        assert 0.005 < cov < 0.15

    def test_all_stages_complete(self, graph):
        r = simulate(graph, StaticAllocation(4), seed=0)
        assert len(r.stage_logs) == len(graph.stages)
        for log, stage in zip(r.stage_logs, graph.stages):
            assert len(log.task_durations) == stage.num_tasks

    def test_elapsed_exceeds_serial_time(self, graph):
        r = simulate(graph, StaticAllocation(48), seed=0)
        assert r.elapsed > graph.app_startup_sec * 0.8


class TestAUCAccounting:
    def test_static_auc_close_to_n_times_t(self, graph):
        r = simulate(graph, StaticAllocation(6), seed=1)
        assert r.auc == pytest.approx(6 * r.elapsed, rel=0.02)

    def test_auc_equals_skyline_integral(self, graph):
        r = simulate(graph, DynamicAllocation(1, 48), seed=1)
        integral = 0.0
        for (t0, n0), (t1, _) in zip(r.skyline, r.skyline[1:]):
            integral += n0 * (t1 - t0)
        assert r.auc == pytest.approx(integral, rel=1e-6)

    def test_skyline_starts_at_zero_and_ends_at_zero(self, graph):
        r = simulate(graph, DynamicAllocation(1, 48), seed=0)
        assert r.skyline[0] == (0.0, 0)
        assert r.skyline[-1][1] == 0


class TestDynamicAllocation:
    def test_ramps_up_under_backlog(self):
        g = make_graph(12_000_000)
        r = simulate(g, DynamicAllocation(1, 48), seed=0)
        assert r.max_executors > 8

    def test_respects_max(self):
        g = make_graph(12_000_000)
        r = simulate(g, DynamicAllocation(1, 6), seed=0)
        assert r.max_executors <= 6

    def test_small_query_stays_small(self):
        g = make_graph(50_000)
        r = simulate(g, DynamicAllocation(1, 48), seed=0)
        assert r.max_executors <= 16

    def test_da_uses_less_auc_than_sa48(self):
        g = make_graph(8_000_000)
        da = simulate(g, DynamicAllocation(1, 48), seed=0)
        sa = simulate(g, StaticAllocation(48), seed=0)
        assert da.auc < sa.auc

    def test_da_slower_than_sa48(self):
        """The ramp-up lag costs time — the §5.4 DA vs SA(48) effect."""
        g = make_graph(8_000_000)
        da = np.mean([simulate(g, DynamicAllocation(1, 48), seed=s).elapsed for s in range(3)])
        sa = np.mean([simulate(g, StaticAllocation(48), seed=s).elapsed for s in range(3)])
        assert da > sa


class TestPredictiveRule:
    def test_allocates_predicted_count(self):
        g = make_graph(8_000_000)
        r = simulate(g, PredictiveRule(n_predicted=20), seed=0)
        assert r.max_executors == 20

    def test_starts_small(self):
        g = make_graph(8_000_000)
        r = simulate(g, PredictiveRule(n_predicted=20, initial_n=5), seed=0)
        # before rule time only 5 executors were requested; skyline must
        # pass through a 5-executor plateau before 20
        counts = [n for _, n in r.skyline]
        assert 5 in counts and max(counts) == 20

    def test_rule_auc_below_sa_same_n(self):
        """Fig 12: Rule(n) occupies less than SA(n) (late arrival)."""
        g = make_graph(8_000_000)
        rule = simulate(g, PredictiveRule(n_predicted=16), seed=0)
        sa = simulate(g, StaticAllocation(16), seed=0)
        assert rule.auc < sa.auc


class TestCoreEfficiency:
    def test_default_ec_is_exact(self):
        assert core_efficiency("any", 4) == 1.0

    def test_other_ec_within_band(self):
        vals = [core_efficiency(f"q{i}", e) for i in range(50) for e in (2, 6, 8)]
        assert all(0.8 < v < 1.35 for v in vals)

    def test_deterministic(self):
        assert core_efficiency("q1", 8) == core_efficiency("q1", 8)

    def test_total_cores_dominates(self):
        """Same k with different e_c lands near the e_c=4 time (Fig 5)."""
        g = make_graph(8_000_000, query="qk")
        t_ec4 = simulate(g, StaticAllocation(16), seed=0).elapsed
        t_ec8 = simulate(
            g, StaticAllocation(8), params=SimParams(cores_per_executor=8), seed=0
        ).elapsed
        assert abs(t_ec8 - t_ec4) / t_ec4 < 0.35
