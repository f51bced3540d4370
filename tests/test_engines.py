"""Engine policies and outcome classification (paper Tables I/II)."""
import numpy as np
import pandas as pd
import pytest

from repro.engines import (
    DaskSimEngine,
    ModinSimEngine,
    Outcome,
    PandasSimEngine,
    SparkPolicySimEngine,
    XorbitsEngine,
)
from repro.engines.base import classify_exception
from repro.core.executor import SimulatedHang
from repro.storage.service import SimulatedOOM


def frames(n=3000, keys=100, seed=0):
    g = np.random.default_rng(seed)
    return {
        "df": pd.DataFrame({"k": g.integers(0, keys, n), "v": g.random(n)}),
        "dim": pd.DataFrame({"k": np.arange(keys), "w": g.random(keys)}),
    }


def q_join_agg(t):
    j = t["df"].merge(t["dim"], on="k")
    j = j.assign(x=j["v"] * j["w"])
    return j.groupby("k").agg(total=("x", "sum")).reset_index()


class TestClassification:
    def test_oom(self):
        assert classify_exception(SimulatedOOM("b", 1, 0)) is Outcome.OOM

    def test_hang(self):
        assert classify_exception(SimulatedHang("x")) is Outcome.HANG

    def test_api(self):
        assert classify_exception(NotImplementedError()) is Outcome.API
        assert classify_exception(AttributeError()) is Outcome.API

    def test_error(self):
        assert classify_exception(ValueError()) is Outcome.ERROR

    def test_memoryerror_is_oom(self):
        assert classify_exception(MemoryError()) is Outcome.OOM


class TestEnginesAgree:
    """All engines produce the same answer when nothing fails."""

    @pytest.mark.parametrize("engine_cls", [
        XorbitsEngine, PandasSimEngine, ModinSimEngine, DaskSimEngine,
        SparkPolicySimEngine,
    ])
    def test_join_agg_correct(self, engine_cls):
        t = frames()
        eng = engine_cls(band_budget=None)
        res = eng.run_query(q_join_agg, t, name="join_agg")
        assert res.outcome is Outcome.OK, res.detail
        exp = q_join_agg(t).sort_values("k").reset_index(drop=True)
        got = res.result.sort_values("k").reset_index(drop=True)
        pd.testing.assert_frame_equal(got, exp, check_dtype=False)


class TestPolicyDifferences:
    def test_pandas_single_band(self):
        eng = PandasSimEngine(band_budget=None)
        eng.materialize(frames())
        cfg = eng.session.cfg
        assert cfg.n_workers == 1 and cfg.bands_per_worker == 1
        assert cfg.dynamic_tiling is False
        eng.cleanup()

    def test_modin_is_eager(self):
        eng = ModinSimEngine(band_budget=None)
        eng.materialize(frames())
        assert eng.session.cfg.free_intermediates is False
        eng.cleanup()

    def test_dask_has_hang_threshold(self):
        eng = DaskSimEngine(band_budget=None, max_tasks=7)
        eng.materialize(frames())
        assert eng.session.cfg.max_tasks == 7
        eng.cleanup()

    def test_spark_sim_fixed_partitions(self):
        eng = SparkPolicySimEngine(band_budget=None, shuffle_partitions=32)
        eng.materialize(frames())
        cfg = eng.session.cfg
        assert cfg.static_reduce == "shuffle"
        assert cfg.static_shuffle_partitions == 32
        eng.cleanup()

    def test_xorbits_dynamic(self):
        eng = XorbitsEngine(band_budget=None)
        eng.materialize(frames())
        assert eng.session.cfg.dynamic_tiling is True
        eng.cleanup()


class TestFailureModes:
    def test_pandas_ooms_on_big_single_node(self):
        t = frames(n=100_000)
        eng = PandasSimEngine(band_budget=200_000)  # ~0.2 MB budget
        res = eng.run_query(q_join_agg, t, name="big")
        assert res.outcome is Outcome.OOM

    def test_xorbits_survives_same_budget_scaled_out(self):
        t = frames(n=100_000)
        eng = XorbitsEngine(band_budget=600_000, n_workers=4,
                            bands_per_worker=2, chunk_limit=150_000)
        res = eng.run_query(q_join_agg, t, name="big")
        assert res.outcome is Outcome.OK, res.detail

    def test_dask_hangs_on_huge_graph(self):
        t = frames(n=50_000)
        eng = DaskSimEngine(band_budget=None, max_tasks=5)
        res = eng.run_query(q_join_agg, t, name="graph")
        assert res.outcome is Outcome.HANG

    def test_dask_iloc_api_failure(self):
        eng = DaskSimEngine(band_budget=None)

        def q_iloc(t):
            return t["df"][t["df"]["v"] < 0.5].iloc[3]

        res = eng.run_query(q_iloc, frames(), name="iloc")
        assert res.outcome is Outcome.API

    def test_modin_eager_ooms_where_xorbits_fits(self):
        """Same budget, same query: the eager engine retains every
        intermediate and dies; the lazy dynamic engine frees and lives."""
        t = frames(n=60_000, keys=20_000)

        def q_chain(tt):
            df = tt["df"]
            df = df.assign(a=df["v"] * 2)
            df = df.assign(b=df["a"] + 1)
            df = df.assign(c=df["b"] * df["v"])
            j = df.merge(tt["dim"], on="k")
            return j.groupby("k").agg(s=("c", "sum")).reset_index()

        budget = 3_000_000
        modin = ModinSimEngine(band_budget=budget, n_workers=1, bands_per_worker=1)
        xo = XorbitsEngine(band_budget=budget, n_workers=1, bands_per_worker=1,
                           chunk_limit=500_000)
        r_modin = modin.run_query(q_chain, t, name="chain")
        r_xo = xo.run_query(q_chain, t, name="chain")
        assert r_xo.outcome is Outcome.OK, r_xo.detail
        assert r_modin.outcome is Outcome.OOM, r_modin.outcome


class TestSkewScenario:
    def test_static_shuffle_dies_dynamic_broadcast_lives(self):
        """The paper's TPCx-AI UC10 case: tiny dim × Zipf fact."""
        g = np.random.default_rng(3)
        n = 80_000
        hot = np.zeros(int(n * 0.8), dtype="int64")
        cold = g.integers(1, 200, n - len(hot))
        fact = pd.DataFrame({"k": np.concatenate([hot, cold]),
                             "v": g.random(n)})
        dim = pd.DataFrame({"k": np.arange(200), "w": g.random(200)})
        t = {"df": fact, "dim": dim}

        budget = 2_500_000  # the hot key's rows exceed this on one reducer
        static = SparkPolicySimEngine(band_budget=budget, shuffle_partitions=8)
        dyn = XorbitsEngine(band_budget=budget, chunk_limit=400_000)
        r_static = static.run_query(q_join_agg, t, name="skew")
        r_dyn = dyn.run_query(q_join_agg, t, name="skew")
        assert r_dyn.outcome is Outcome.OK, r_dyn.detail
        assert r_static.outcome is Outcome.OOM
