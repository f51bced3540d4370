"""Ablation: dynamic tiling on/off (paper Fig. 9a, supplementary to the
tables). The paper toggles dynamic tiling on merge-heavy TPC-H queries
(Q2: 4 merges, Q7: 9) and reports 7.08× / 10.59× — at laptop scale the
factor is smaller but dynamic must stay ahead on the merge-heavy + skew
workloads (EXPERIMENTS.md records both)."""
import numpy as np
import pandas as pd
import pytest

from repro.engines import XorbitsEngine
from repro.synth_data import (
    tpch_tables_pdf,
    tpcxai_customers_pdf,
    tpcxai_transactions_pdf,
)
from repro.workloads.pipelines import PIPELINES
from repro.workloads.tpch import QUERIES

SF = 0.05
PIPE_SF = 0.05


def _engine(dynamic: bool) -> XorbitsEngine:
    return XorbitsEngine(band_budget=None, dynamic_tiling=dynamic,
                         static_reduce="shuffle",
                         static_shuffle_partitions=64)


@pytest.fixture(scope="module")
def tables_all():
    return tpch_tables_pdf(SF)


@pytest.mark.parametrize("dynamic", [True, False], ids=["dy-on", "dy-off"])
@pytest.mark.parametrize("qname", ["q02", "q07"])
def test_ablation_dynamic_tpch(benchmark, qname, dynamic, tables_all):
    q = QUERIES[qname]
    tables = {k: tables_all[k] for k in q.tables}
    engine = _engine(dynamic)

    def run():
        res = engine.run_query(q.fn, tables, name=qname)
        assert res.outcome.value == "ok", res.detail
        return res

    benchmark.pedantic(run, rounds=2, iterations=1)
    benchmark.extra_info["dynamic_tiling"] = dynamic


@pytest.mark.parametrize("dynamic", [True, False], ids=["dy-on", "dy-off"])
def test_ablation_dynamic_skewed_uc10(benchmark, dynamic):
    """The data-imbalance case (Fig. 8a): dynamic broadcasts the tiny
    dimension; static hash-shuffles the Zipf fact."""
    p = PIPELINES["tpcxai_uc10"]
    tables = {
        "transactions": tpcxai_transactions_pdf(PIPE_SF),
        "customers": tpcxai_customers_pdf(PIPE_SF),
    }
    engine = _engine(dynamic)

    def run():
        res = engine.run_query(p.fn, tables, name="uc10")
        assert res.outcome.value == "ok", res.detail

    benchmark.pedantic(run, rounds=2, iterations=1)
    benchmark.extra_info["dynamic_tiling"] = dynamic
