"""Benchmark backing paper Table IV: live framework-version probing
(printed by ``jobs/table4_versions.py``)."""
from repro.workloads.registry import framework_versions


def test_table4_versions(benchmark):
    t = benchmark(framework_versions)
    assert "PySpark" in set(t["framework"])
