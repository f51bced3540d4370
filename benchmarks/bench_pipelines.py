"""DS pipelines end-to-end (paper Fig. 8a): xorbits vs the baseline
policies on census / plasticc / the skewed TPCx-AI UC10."""
import pytest

from repro.engines import ModinSimEngine, SparkPolicySimEngine, XorbitsEngine
from repro.workloads.pipelines import PIPELINES

SF = 0.05

ENGINES = {
    "xorbits": lambda: XorbitsEngine(band_budget=None),
    "modin": lambda: ModinSimEngine(band_budget=None),
    "pyspark-sim": lambda: SparkPolicySimEngine(band_budget=None),
}


@pytest.mark.parametrize("engine_name", list(ENGINES))
@pytest.mark.parametrize("pipeline", sorted(PIPELINES))
def test_pipeline(benchmark, pipeline, engine_name):
    p = PIPELINES[pipeline]
    tables = p.tables_fn(SF)
    engine = ENGINES[engine_name]()

    def run():
        res = engine.run_query(p.fn, tables, name=pipeline)
        assert res.outcome.value == "ok", res.detail

    benchmark.pedantic(run, rounds=2, iterations=1)
    benchmark.extra_info["pipeline"] = pipeline
