"""Reproduce Fig 4 + Fig 8 + Fig 9 (§5.2): PPM time-prediction accuracy.

Usage: spark-submit jobs/prediction.py   (or: python jobs/prediction.py)
"""
try:
    from _session import get_session  # spark-submit puts jobs/ on sys.path
except ImportError:  # running as a module from the repo root
    from jobs._session import get_session


def main() -> None:
    spark = get_session("prediction")
    from repro.experiments import exp_prediction
    from repro.experiments.common import dataset_for_paper_sf

    ds = dataset_for_paper_sf(spark, 100)
    print(exp_prediction.format_report(ds))
    curves = exp_prediction.example_curves(ds, "t7_ss_star_2000")
    print("\n== Fig 8: series for t7_ss_star_2000 (q94 analogue) ==")
    for series, times in curves.items():
        print(f"{series:<7}", {n: round(t, 1) for n, t in times.items()})
    spark.stop()


if __name__ == "__main__":
    main()
