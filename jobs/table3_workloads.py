"""Reproduce paper Table III: the workload roster, with our measured
lite-dataset bytes next to the paper's sizes.

    spark-submit jobs/table3_workloads.py [--quick]
"""
import sys
import os

sys.path.insert(0, os.path.join(os.path.dirname(__file__)))
from _common import emit  # noqa: E402

from repro.workloads.registry import table3  # noqa: E402


def main() -> None:
    sf = 0.02 if "--quick" in sys.argv else None
    emit("Table III — workloads", table3(measure=True, sf_override=sf))


if __name__ == "__main__":
    main()
