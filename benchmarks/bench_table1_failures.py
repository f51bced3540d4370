"""Benchmark backing paper Table I: per-engine wall time on
representative TPC-H-lite queries (the full 3-SF failure sweep lives in
``jobs/table1_failed_queries.py``; this bench tracks the engines' speed
at a size where all of them still succeed)."""
import pytest

from repro.engines import (
    DaskSimEngine,
    ModinSimEngine,
    PandasSimEngine,
    SparkPolicySimEngine,
    XorbitsEngine,
)
from repro.synth_data import tpch_tables_pdf
from repro.workloads.tpch import QUERIES

SF = 0.02
QUERY_SET = ["q01", "q03", "q06", "q13"]

ENGINES = {
    "xorbits": lambda: XorbitsEngine(band_budget=None),
    "pandas": lambda: PandasSimEngine(band_budget=None),
    "modin": lambda: ModinSimEngine(band_budget=None),
    "dask": lambda: DaskSimEngine(band_budget=None),
    "pyspark-sim": lambda: SparkPolicySimEngine(band_budget=None),
}


@pytest.fixture(scope="module")
def tables_all():
    return tpch_tables_pdf(SF)


@pytest.mark.parametrize("engine_name", list(ENGINES))
def test_table1_query_suite(benchmark, engine_name, tables_all):
    engine = ENGINES[engine_name]()

    def run():
        for qname in QUERY_SET:
            q = QUERIES[qname]
            res = engine.run_query(
                q.fn, {k: tables_all[k] for k in q.tables}, name=qname
            )
            assert res.outcome.value == "ok", (qname, res.detail)

    benchmark.pedantic(run, rounds=2, iterations=1, warmup_rounds=0)
    benchmark.extra_info["queries"] = ",".join(QUERY_SET)
    benchmark.extra_info["sf"] = SF
