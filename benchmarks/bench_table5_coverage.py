"""Benchmark backing paper Table V: the 30-case API-coverage sweep on
the local engines (the full run incl. the real pyspark.pandas is
``jobs/table5_api_coverage.py``)."""
import pytest

from repro.harness.coverage import CASES, run_coverage, table5


def test_table5_coverage_sweep(benchmark):
    def run():
        res = run_coverage(include_pyspark=False)
        return table5(res)

    t = benchmark.pedantic(run, rounds=1, iterations=1)
    benchmark.extra_info["coverage"] = t.to_dict("records")[0]
    # the reproduction's own frontend must stay at the paper's 96.7 %
    assert t.loc["coverage rate", "xorbits"] >= 90.0
