"""Reproduce Fig 2 + Fig 3a-b (§2): production workload insights over the
synthetic trace, computed with Spark SQL.

Usage: spark-submit jobs/workload_insights.py
"""
try:
    from _session import get_session  # spark-submit puts jobs/ on sys.path
except ImportError:  # running as a module from the repo root
    from jobs._session import get_session


def main() -> None:
    spark = get_session("workload_insights")
    from repro.experiments import exp_workload_insights

    print(exp_workload_insights.format_report(spark))
    spark.stop()


if __name__ == "__main__":
    main()
