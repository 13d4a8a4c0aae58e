"""Reproduce Fig 15 + the §5.7 ablation: feature importance.

Usage: spark-submit jobs/importance.py
"""
try:
    from _session import get_session  # spark-submit puts jobs/ on sys.path
except ImportError:  # running as a module from the repo root
    from jobs._session import get_session


def main() -> None:
    spark = get_session("importance")
    from repro.experiments import exp_importance
    from repro.experiments.common import dataset_for_paper_sf

    ds = dataset_for_paper_sf(spark, 100)
    print(exp_importance.format_report(ds))
    spark.stop()


if __name__ == "__main__":
    main()
