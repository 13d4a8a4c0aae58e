"""Reproduce Fig 1 + Fig 3c (§1, §2.4): the price-perf trade-off and the
optimal-executor-count distribution.

Usage: spark-submit jobs/ground_truth.py
"""
try:
    from _session import get_session  # spark-submit puts jobs/ on sys.path
except ImportError:  # running as a module from the repo root
    from jobs._session import get_session


def main() -> None:
    spark = get_session("ground_truth")
    from repro.experiments import exp_ground_truth
    from repro.experiments.common import dataset_for_paper_sf

    ds10 = dataset_for_paper_sf(spark, 10)
    ds100 = dataset_for_paper_sf(spark, 100)
    print(exp_ground_truth.format_report(ds10, ds100))
    spark.stop()


if __name__ == "__main__":
    main()
