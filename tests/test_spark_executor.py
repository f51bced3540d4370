"""SparkExecutor: the subtask-per-Spark-task execution path
(DESIGN.md § 2 — the paper's subtask ≈ a Spark task)."""
import numpy as np
import pandas as pd
import pytest

from repro.core.config import EngineConfig
from repro.frontend import dataframe as xpd
from repro.frontend import tensor as xnp
from repro.frontend.session import XSession


@pytest.fixture()
def spark_sess(spark):
    s = XSession(
        EngineConfig(chunk_limit=40_000, n_workers=2, bands_per_worker=2),
        spark=spark,
    )
    yield s
    s.close()


def test_spark_executor_selected(spark_sess):
    from repro.core.executor import SparkExecutor

    assert isinstance(spark_sess.executor, SparkExecutor)


def test_groupby_on_spark_executor(spark_sess):
    g = np.random.default_rng(0)
    pdf = pd.DataFrame({"k": g.integers(0, 20, 4000), "v": g.random(4000)})
    df = xpd.from_pandas(pdf, spark_sess)
    got = df.groupby("k").agg(total=("v", "sum")).to_pandas()
    exp = pdf.groupby("k").agg(total=("v", "sum"))
    pd.testing.assert_frame_equal(got.sort_index(), exp, check_dtype=False)


def test_merge_on_spark_executor(spark_sess):
    g = np.random.default_rng(1)
    left = pd.DataFrame({"k": g.integers(0, 50, 3000), "v": g.random(3000)})
    right = pd.DataFrame({"k": np.arange(50), "w": g.random(50)})
    got = (
        xpd.from_pandas(left, spark_sess)
        .merge(xpd.from_pandas(right, spark_sess), on="k")
        .to_pandas()
    )
    exp = left.merge(right, on="k")
    assert len(got) == len(exp)
    assert abs(got["v"].sum() - exp["v"].sum()) < 1e-6


def test_tensor_on_spark_executor(spark_sess):
    a_np = np.random.default_rng(2).random((2000, 16))
    q, r = xnp.linalg.qr(xnp.array(a_np, spark_sess))
    np.testing.assert_allclose(q.to_numpy() @ r.to_numpy(), a_np, atol=1e-9)


def test_spark_wave_parallelism_used(spark_sess):
    # enough chunks to trigger a real sc.parallelize wave (>1 subtask)
    pdf = pd.DataFrame({"x": np.arange(30_000, dtype="float64")})
    df = xpd.from_pandas(pdf, spark_sess)
    got = df.assign(y=df["x"] * 2).to_pandas()
    assert (got["y"].to_numpy() == pdf["x"].to_numpy() * 2).all()
    assert spark_sess.executor.tasks_executed >= 2
