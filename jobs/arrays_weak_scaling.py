"""Array weak-scaling job (paper Fig. 8c/d, supplementary): QR and LR
throughput as simulated sockets grow, plus Xorbits-auto vs Dask-manual
chunking.

    spark-submit jobs/arrays_weak_scaling.py
"""
import os
import sys

import pandas as pd

sys.path.insert(0, os.path.join(os.path.dirname(__file__)))
from _common import emit  # noqa: E402

from repro.workloads.arrays import (  # noqa: E402
    make_session,
    run_linear_regression,
    run_qr,
    run_qr_dask_like,
    weak_scaling_points,
)


def main() -> None:
    rows = []
    for sockets, n_rows, n_cols in weak_scaling_points(150_000, 32, [1, 2, 4]):
        s = make_session(n_workers=sockets, bands_per_worker=2,
                         chunk_limit=4 << 20)
        qr = run_qr(s, n_rows, n_cols, verify=False)
        lr = run_linear_regression(s, n_rows * 2, 16)
        rows.append({"sockets": sockets, "workload": "qr",
                     "rows": n_rows, "tput_MBps": qr.throughput / 1e6})
        rows.append({"sockets": sockets, "workload": "lr",
                     "rows": n_rows * 2, "tput_MBps": lr.throughput / 1e6})
        s.close()

    s = make_session(chunk_limit=4 << 20)
    auto = run_qr(s, 150_000, 32, verify=False)
    manual = run_qr_dask_like(s, 150_000, 32, chunk_rows=64)
    rows.append({"sockets": 1, "workload": "qr-auto-rechunk",
                 "rows": 150_000, "tput_MBps": auto.throughput / 1e6})
    rows.append({"sockets": 1, "workload": "qr-dask-manual(64rows)",
                 "rows": 150_000, "tput_MBps": manual.throughput / 1e6})
    s.close()
    emit("Array weak scaling", pd.DataFrame(rows).round(1))
    print("\npaper Fig. 8c/d: Xorbits over Dask — QR 1.74x, LR 5.88x avg")


if __name__ == "__main__":
    main()
