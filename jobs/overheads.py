"""Reproduce the §5.6 overhead table (training/scoring/featurization).

Usage: spark-submit jobs/overheads.py
"""
import time

try:
    from _session import get_session  # spark-submit puts jobs/ on sys.path
except ImportError:  # running as a module from the repo root
    from jobs._session import get_session


def main() -> None:
    spark = get_session("overheads")
    from repro.experiments import exp_overheads
    from repro.experiments.common import dataset_for_paper_sf
    from repro.core.features import featurize_sql
    from repro.workloads.tpcds_lite import QUERIES

    ds = dataset_for_paper_sf(spark, 100)
    print(exp_overheads.format_report(ds))

    # plan featurization needs a live optimizer — measured here, not in
    # the Spark-free experiment module
    sample = QUERIES[:10]
    featurize_sql(spark, sample[0].sql)  # warm
    t0 = time.perf_counter()
    for q in sample:
        featurize_sql(spark, q.sql)
    ms = (time.perf_counter() - t0) / len(sample) * 1e3
    print(f"plan featurization:        {ms:7.1f} ms   (paper ~10.3 ms)")
    spark.stop()


if __name__ == "__main__":
    main()
