"""Reproduce paper Table I: number of failed TPC-H queries per framework
at the three scale points.

    spark-submit jobs/table1_failed_queries.py [--quick] [--no-pyspark]

``--quick`` shrinks the SF map (smoke run); ``--no-pyspark`` skips the
real pandas-on-Spark API pass (the composite PySpark column then shows
only simulated scale failures). Tidy per-query results are written to
``results/table1_runs.csv`` (reused by the Table II job).
"""
import os
import sys

sys.path.insert(0, os.path.join(os.path.dirname(__file__)))
from _common import emit, get_spark, results_dir  # noqa: E402

from repro.harness.failure import SF_MAP, run_suite, table1  # noqa: E402


def main() -> None:
    quick = "--quick" in sys.argv
    use_pyspark = "--no-pyspark" not in sys.argv
    sfs = {"SF10": 0.005, "SF100": 0.02} if quick else SF_MAP
    spark = get_spark("table1") if use_pyspark else None
    results = run_suite(sfs=sfs, spark=spark, verbose=True)
    out = os.path.join(results_dir(), "table1_runs.csv")
    results.to_csv(out, index=False)
    print(f"\nper-query outcomes -> {out}")
    engines = ["pandas", "pyspark" if use_pyspark else "pyspark-sim",
               "dask", "modin", "xorbits"]
    emit("Table I — failed TPC-H-lite queries", table1(results, engines=engines))
    print(
        "\npaper Table I (SF10/100/1000): pandas 0/17/22, PySpark 3/3/4, "
        "Dask 1/1/5, Modin 0/1/22, (Xorbits 0/0/0 implied)"
    )


if __name__ == "__main__":
    main()
