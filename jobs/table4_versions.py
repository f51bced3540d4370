"""Reproduce paper Table IV: frameworks and versions (live-probed, with
the simulator substitutions labelled).

    spark-submit jobs/table4_versions.py
"""
import os
import sys

sys.path.insert(0, os.path.join(os.path.dirname(__file__)))
from _common import emit  # noqa: E402

from repro.workloads.registry import framework_versions  # noqa: E402


def main() -> None:
    emit("Table IV — frameworks", framework_versions())
    print(
        "\npaper Table IV: NumPy 1.26, pandas 2.1.1, Xorbits 0.6.3, "
        "PySpark 3.5.0, Dask 2023.9, Modin 0.24.1"
    )


if __name__ == "__main__":
    main()
