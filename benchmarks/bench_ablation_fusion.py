"""Ablation: graph-level (coloring) and operator-level fusion on/off
(paper Fig. 9b: 3.80×/2.04× for graph fusion on Q7/Q8, ~16 % for
operator fusion)."""
import pytest

from repro.engines import XorbitsEngine
from repro.synth_data import tpch_tables_pdf
from repro.workloads.tpch import QUERIES

SF = 0.05


@pytest.fixture(scope="module")
def tables_all():
    return tpch_tables_pdf(SF)


CONFIGS = {
    "g-on_o-on": dict(graph_fusion=True, operator_fusion=True),
    "g-on_o-off": dict(graph_fusion=True, operator_fusion=False),
    "g-off_o-off": dict(graph_fusion=False, operator_fusion=False),
}


@pytest.mark.parametrize("cfg_name", list(CONFIGS))
@pytest.mark.parametrize("qname", ["q07", "q08"])
def test_ablation_fusion(benchmark, qname, cfg_name, tables_all):
    q = QUERIES[qname]
    tables = {k: tables_all[k] for k in q.tables}
    engine = XorbitsEngine(band_budget=None, **CONFIGS[cfg_name])

    def run():
        res = engine.run_query(q.fn, tables, name=qname)
        assert res.outcome.value == "ok", res.detail

    benchmark.pedantic(run, rounds=2, iterations=1)
    benchmark.extra_info["config"] = cfg_name
