"""Tests for the synthetic production trace + the §2 Spark SQL analyses."""
import pytest

from repro.experiments.exp_workload_insights import compute_insights
from repro.workloads.production_trace import MAX_INT32, TraceConfig, generate_trace

SMALL = TraceConfig(n_apps=1500, n_clusters=60, seed=7)


@pytest.fixture(scope="module")
def trace(spark):
    return generate_trace(spark, SMALL)


@pytest.fixture(scope="module")
def insights(spark):
    return compute_insights(spark, SMALL)


class TestTraceGeneration:
    def test_app_count(self, trace):
        apps, _ = trace
        assert apps.count() == SMALL.n_apps

    def test_query_rows_match_app_counts(self, trace):
        apps, queries = trace
        total = apps.groupBy().sum("num_queries").first()[0]
        assert queries.count() == total

    def test_deterministic(self, spark):
        a1, _ = generate_trace(spark, SMALL)
        a2, _ = generate_trace(spark, SMALL)
        assert a1.toPandas().equals(a2.toPandas())

    def test_da_bounds_structure(self, trace):
        apps, _ = trace
        pdf = apps.toPandas()
        da = pdf[pdf.dynamic_allocation]
        defaults = da[da.max_executors == MAX_INT32]
        assert (defaults.min_executors == 0).all()
        non_da = pdf[~pdf.dynamic_allocation]
        assert (non_da.static_executors >= 1).all()


class TestInsights:
    def test_multi_query_share(self, insights):
        assert insights["multi_query_share"] > 0.60  # Fig 2a

    def test_cov_medians_ordered(self, insights):
        """Fig 2b: CoV(time) > CoV(rows) > CoV(ops)."""
        assert (
            insights["median_cov_time"]
            > insights["median_cov_rows"]
            > insights["median_cov_ops"]
        )

    def test_cov_medians_magnitudes(self, insights):
        assert insights["median_cov_ops"] >= 0.18
        assert insights["median_cov_rows"] >= 0.35
        assert insights["median_cov_time"] >= 0.55

    def test_exclusive_share_near_70pct(self, insights):
        assert 0.5 < insights["exclusive_cluster_share"] < 0.9  # Fig 2c

    def test_da_share_near_59pct(self, insights):
        assert 0.5 < insights["da_share"] < 0.68  # §2.2

    def test_default_bounds_near_97pct(self, insights):
        assert insights["da_default_bounds_share"] > 0.9

    def test_static_default_near_80pct(self, insights):
        assert 0.7 < insights["static_default2_share"] < 0.9  # Fig 3b
