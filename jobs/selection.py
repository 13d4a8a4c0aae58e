"""Reproduce Fig 10 + Fig 11 (§5.3): configuration selection.

Usage: spark-submit jobs/selection.py
"""
try:
    from _session import get_session  # spark-submit puts jobs/ on sys.path
except ImportError:  # running as a module from the repo root
    from jobs._session import get_session


def main() -> None:
    spark = get_session("selection")
    from repro.experiments import exp_selection
    from repro.experiments.common import dataset_for_paper_sf

    ds = dataset_for_paper_sf(spark, 100)
    print(exp_selection.format_report(ds))
    spark.stop()


if __name__ == "__main__":
    main()
