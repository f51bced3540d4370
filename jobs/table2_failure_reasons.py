"""Reproduce paper Table II: reasons frameworks fail at the largest SF.

    spark-submit jobs/table2_failure_reasons.py

Reuses ``results/table1_runs.csv`` when present (run the Table I job
first for the full sweep); otherwise runs the largest SF only.
"""
import os
import sys

import pandas as pd

sys.path.insert(0, os.path.join(os.path.dirname(__file__)))
from _common import emit, get_spark, results_dir  # noqa: E402

from repro.harness.failure import SF_MAP, run_suite, table2  # noqa: E402


def main() -> None:
    cached = os.path.join(results_dir(), "table1_runs.csv")
    if os.path.exists(cached):
        results = pd.read_csv(cached).fillna({"detail": ""})
        print(f"using cached outcomes from {cached}")
    else:
        spark = get_spark("table2")
        results = run_suite(sfs={"SF1000": SF_MAP["SF1000"]}, spark=spark,
                            verbose=True)
    engines = ["pyspark", "dask", "modin", "xorbits"]
    avail = [e for e in engines if (results["engine"] == e).any()]
    if "pyspark" not in avail:
        avail = ["pyspark-sim"] + [e for e in avail]
    emit("Table II — failure reasons at SF1000",
         table2(results, sf="SF1000", engines=avail))
    print(
        "\npaper Table II (PySpark/Dask/Modin): API 3/0/0, Hang 0/2/0, "
        "OOM-or-killed 1/3/22, Total 4/5/22"
    )


if __name__ == "__main__":
    main()
