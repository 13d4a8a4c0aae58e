"""Shared fixtures for Spark-dependent tests.

``spark`` comes from the repository-root conftest (one session for the
whole run). Here we add session-scoped TPC-DS-lite tables at a small
scale factor, both as registered Spark temp views and as pandas frames
for the DuckDB oracle.
"""
import pytest

from repro.workloads.tpcds_lite import materialize

TEST_SF = 0.005


@pytest.fixture(scope="session")
def tpcds_tables(spark, tmp_path_factory):
    root = tmp_path_factory.mktemp("tpcds_lite")
    return materialize(spark, sf=TEST_SF, root=str(root))


@pytest.fixture(scope="session")
def tpcds_pandas(tpcds_tables):
    return {name: df.toPandas() for name, df in tpcds_tables.items()}
