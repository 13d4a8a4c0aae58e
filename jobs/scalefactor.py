"""Reproduce Fig 14 (§5.5): generalisation across input data sizes.

Usage: spark-submit jobs/scalefactor.py
"""
try:
    from _session import get_session  # spark-submit puts jobs/ on sys.path
except ImportError:  # running as a module from the repo root
    from jobs._session import get_session


def main() -> None:
    spark = get_session("scalefactor")
    from repro.experiments import exp_scalefactor
    from repro.experiments.common import dataset_for_paper_sf

    ds10 = dataset_for_paper_sf(spark, 10)
    ds100 = dataset_for_paper_sf(spark, 100)
    print(exp_scalefactor.format_report(ds10, ds100))
    spark.stop()


if __name__ == "__main__":
    main()
