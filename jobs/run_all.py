"""Run every experiment job in sequence — the full evaluation section.

Usage: spark-submit jobs/run_all.py
"""
try:
    from _session import get_session  # spark-submit puts jobs/ on sys.path
except ImportError:  # running as a module from the repo root
    from jobs._session import get_session


def main() -> None:
    spark = get_session("run-all")
    from repro.experiments import (
        exp_allocation,
        exp_core_impact,
        exp_ground_truth,
        exp_importance,
        exp_overheads,
        exp_prediction,
        exp_scalefactor,
        exp_selection,
        exp_workload_insights,
    )
    from repro.experiments.common import dataset_for_paper_sf

    ds10 = dataset_for_paper_sf(spark, 10)
    ds100 = dataset_for_paper_sf(spark, 100)
    sections = [
        exp_workload_insights.format_report(spark),
        exp_ground_truth.format_report(ds10, ds100),
        exp_core_impact.format_report(ds100),
        exp_prediction.format_report(ds100),
        exp_selection.format_report(ds100),
        exp_allocation.format_report(ds100),
        exp_scalefactor.format_report(ds10, ds100),
        exp_importance.format_report(ds100),
        exp_overheads.format_report(ds100),
    ]
    print(("\n" + "=" * 72 + "\n").join(sections))
    spark.stop()


if __name__ == "__main__":
    main()
