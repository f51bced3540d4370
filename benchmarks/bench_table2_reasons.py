"""Benchmark backing paper Table II: time-to-classified-failure of the
baseline engines at the largest scale point. Failing fast (OOM raised by
the meter before hours of futile work) is itself a property the harness
relies on; the Table II reason counts are produced by
``jobs/table2_failure_reasons.py``."""
import pytest

from repro.engines import ModinSimEngine, Outcome, PandasSimEngine
from repro.synth_data import tpch_tables_pdf
from repro.workloads.tpch import QUERIES

SF = 0.1  # SF100 stand-in
BUDGET = 12 << 20  # small budget so failure is certain at this size
# (modin spreads the ~200 MB lineitem over 8 bands; 12 MB/band cannot
# hold the retained eager intermediates, matching the Table II column)


@pytest.fixture(scope="module")
def tables_all():
    return tpch_tables_pdf(SF)


@pytest.mark.parametrize("engine_cls", [PandasSimEngine, ModinSimEngine])
def test_table2_failfast(benchmark, engine_cls, tables_all):
    q = QUERIES["q01"]
    tables = {k: tables_all[k] for k in q.tables}
    engine = engine_cls(band_budget=BUDGET)

    def run():
        res = engine.run_query(q.fn, tables, name="q01")
        assert res.outcome is Outcome.OOM, res.outcome
        return res

    res = benchmark.pedantic(run, rounds=2, iterations=1)
    benchmark.extra_info["outcome"] = res.outcome.value
