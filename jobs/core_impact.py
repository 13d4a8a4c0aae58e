"""Reproduce Table 1 + Fig 5 (§3.3): the impact of total cores k = n·e_c.

Usage: spark-submit jobs/core_impact.py
"""
try:
    from _session import get_session  # spark-submit puts jobs/ on sys.path
except ImportError:  # running as a module from the repo root
    from jobs._session import get_session


def main() -> None:
    spark = get_session("core_impact")
    from repro.experiments import exp_core_impact
    from repro.experiments.common import dataset_for_paper_sf

    ds = dataset_for_paper_sf(spark, 100)
    print(exp_core_impact.format_report(ds))
    spark.stop()


if __name__ == "__main__":
    main()
