"""Reproduce Fig 12 + Fig 13 (§5.4): predictive vs static vs dynamic
allocation — the paper's headline AUC savings.

Usage: spark-submit jobs/allocation.py
"""
try:
    from _session import get_session  # spark-submit puts jobs/ on sys.path
except ImportError:  # running as a module from the repo root
    from jobs._session import get_session


def main() -> None:
    spark = get_session("allocation")
    from repro.experiments import exp_allocation
    from repro.experiments.common import dataset_for_paper_sf

    ds = dataset_for_paper_sf(spark, 100)
    print(exp_allocation.format_report(ds))
    spark.stop()


if __name__ == "__main__":
    main()
