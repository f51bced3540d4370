"""Reproduce paper Table V: API coverage rate on 30 groupby/merge/pivot
cases, including the REAL pandas-on-Spark engine.

    spark-submit jobs/table5_api_coverage.py [--no-pyspark]
"""
import os
import sys

sys.path.insert(0, os.path.join(os.path.dirname(__file__)))
from _common import emit, get_spark, results_dir  # noqa: E402

from repro.harness.coverage import run_coverage, table5  # noqa: E402


def main() -> None:
    use_pyspark = "--no-pyspark" not in sys.argv
    if use_pyspark:
        get_spark("table5")  # starts the JVM for pyspark.pandas
    results = run_coverage(include_pyspark=use_pyspark, verbose=True)
    out = os.path.join(results_dir(), "table5_cases.csv")
    results.to_csv(out, index=False)
    print(f"\nper-case results -> {out}")
    emit("Table V — coverage rate (%)", table5(results))
    print("\npaper Table V: Xorbits 96.7, Modin 96.7, Dask 46.7, PySpark 36.7")


if __name__ == "__main__":
    main()
