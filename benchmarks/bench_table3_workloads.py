"""Benchmark backing paper Table III: generation + in-memory sizing of
every workload dataset (the roster itself is printed by
``jobs/table3_workloads.py``)."""
import pytest

from repro.workloads.registry import WORKLOADS, table3

SF = 0.02


def test_table3_generation(benchmark):
    def run():
        t = table3(measure=True, sf_override=SF)
        assert len(t) == len(WORKLOADS)
        return t

    t = benchmark.pedantic(run, rounds=2, iterations=1)
    benchmark.extra_info["workloads"] = len(t)
