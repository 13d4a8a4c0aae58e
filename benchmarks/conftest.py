"""Benchmark fixtures: the paper-scale datasets (SF mapping of DESIGN.md).

Datasets load from ``.cache/repro`` when present; a cold run builds them
through the SparkSession (a few minutes once).
"""
import pytest

from repro.experiments.common import SF_MAP, build_dataset, load_cached_dataset


def _dataset(spark_fixture_request, paper_sf: int):
    sf = SF_MAP[paper_sf]
    ds = load_cached_dataset(sf)
    if ds is None:
        spark = spark_fixture_request.getfixturevalue("spark")
        ds = build_dataset(spark, sf=sf)
    return ds


@pytest.fixture(scope="session")
def ds100(request):
    return _dataset(request, 100)


@pytest.fixture(scope="session")
def ds10(request):
    return _dataset(request, 10)
