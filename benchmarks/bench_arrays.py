"""Array workloads (paper Fig. 8c/d): QR and linear-regression
throughput, Xorbits auto-rechunk vs Dask-like manual chunking, plus a
weak-scaling sweep over simulated sockets."""
import pytest

from repro.workloads.arrays import (
    make_session,
    run_linear_regression,
    run_qr,
    run_qr_dask_like,
    weak_scaling_points,
)

N_COLS = 32
BASE_ROWS = 60_000


@pytest.mark.parametrize("variant", ["xorbits-auto", "dask-manual-small",
                                     "dask-manual-large"])
def test_qr_chunking_variants(benchmark, variant):
    s = make_session(chunk_limit=2 << 20)

    def run():
        if variant == "xorbits-auto":
            r = run_qr(s, BASE_ROWS, N_COLS, verify=False)
        elif variant == "dask-manual-small":
            r = run_qr_dask_like(s, BASE_ROWS, N_COLS, chunk_rows=N_COLS)
        else:
            r = run_qr_dask_like(s, BASE_ROWS, N_COLS, chunk_rows=BASE_ROWS // 2)
        assert r.ok
        return r

    r = benchmark.pedantic(run, rounds=2, iterations=1)
    benchmark.extra_info["throughput_MBps"] = round(r.throughput / 1e6, 1)
    s.close()


@pytest.mark.parametrize("sockets", [1, 2, 4])
def test_qr_weak_scaling(benchmark, sockets):
    (_, rows, cols), = weak_scaling_points(BASE_ROWS, N_COLS, [sockets])
    s = make_session(n_workers=sockets, bands_per_worker=2, chunk_limit=2 << 20)

    def run():
        r = run_qr(s, rows, cols, verify=False)
        assert r.ok
        return r

    r = benchmark.pedantic(run, rounds=2, iterations=1)
    benchmark.extra_info["sockets"] = sockets
    benchmark.extra_info["throughput_MBps"] = round(r.throughput / 1e6, 1)
    s.close()


@pytest.mark.parametrize("sockets", [1, 2, 4])
def test_lr_weak_scaling(benchmark, sockets):
    (_, rows, cols), = weak_scaling_points(100_000, 16, [sockets])
    s = make_session(n_workers=sockets, bands_per_worker=2, chunk_limit=2 << 20)

    def run():
        r = run_linear_regression(s, rows, cols)
        assert r.ok, r.detail
        return r

    r = benchmark.pedantic(run, rounds=2, iterations=1)
    benchmark.extra_info["sockets"] = sockets
    benchmark.extra_info["throughput_MBps"] = round(r.throughput / 1e6, 1)
    s.close()
