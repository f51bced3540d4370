"""Ablation job (paper Fig. 9, supplementary): dynamic tiling and the
fusion passes toggled on merge-heavy queries + the skewed UC10 pipeline.

    spark-submit jobs/ablation.py [--sf 0.05]
"""
import os
import sys
import time

import pandas as pd

sys.path.insert(0, os.path.join(os.path.dirname(__file__)))
from _common import emit  # noqa: E402

from repro.engines import XorbitsEngine  # noqa: E402
from repro.synth_data import (  # noqa: E402
    tpch_tables_pdf,
    tpcxai_customers_pdf,
    tpcxai_transactions_pdf,
)
from repro.workloads.pipelines import PIPELINES  # noqa: E402
from repro.workloads.tpch import QUERIES  # noqa: E402


def _time(engine, fn, tables, name):
    best = float("inf")
    for _ in range(3):
        res = engine.run_query(fn, tables, name=name)
        assert res.outcome.value == "ok", (name, res.detail)
        best = min(best, res.seconds)
    return best


def main() -> None:
    sf = 0.05
    if "--sf" in sys.argv:
        sf = float(sys.argv[sys.argv.index("--sf") + 1])
    tables_all = tpch_tables_pdf(sf)
    uc10_tables = {
        "transactions": tpcxai_transactions_pdf(sf),
        "customers": tpcxai_customers_pdf(sf),
    }

    rows = []
    # dynamic tiling on/off (Fig. 9a — paper: Q2 7.08x, Q7 10.59x)
    for qname in ("q02", "q07"):
        q = QUERIES[qname]
        t = {k: tables_all[k] for k in q.tables}
        on = _time(XorbitsEngine(band_budget=None), q.fn, t, qname)
        off = _time(
            XorbitsEngine(band_budget=None, dynamic_tiling=False,
                          static_reduce="shuffle",
                          static_shuffle_partitions=64),
            q.fn, t, qname,
        )
        rows.append({"experiment": f"dynamic-tiling {qname}", "on_s": on,
                     "off_s": off, "speedup": off / on})
    p = PIPELINES["tpcxai_uc10"]
    on = _time(XorbitsEngine(band_budget=None), p.fn, uc10_tables, "uc10")
    off = _time(
        XorbitsEngine(band_budget=None, dynamic_tiling=False,
                      static_reduce="shuffle",
                      static_shuffle_partitions=64),
        p.fn, uc10_tables, "uc10",
    )
    rows.append({"experiment": "dynamic-tiling uc10(skew)", "on_s": on,
                 "off_s": off, "speedup": off / on})

    # fusion (Fig. 9b — paper: graph fusion Q7 3.80x, Q8 2.04x; op ~16%)
    for qname in ("q07", "q08"):
        q = QUERIES[qname]
        t = {k: tables_all[k] for k in q.tables}
        full = _time(XorbitsEngine(band_budget=None), q.fn, t, qname)
        no_g = _time(
            XorbitsEngine(band_budget=None, graph_fusion=False,
                          operator_fusion=False),
            q.fn, t, qname,
        )
        no_o = _time(
            XorbitsEngine(band_budget=None, operator_fusion=False),
            q.fn, t, qname,
        )
        rows.append({"experiment": f"graph-fusion {qname}", "on_s": full,
                     "off_s": no_g, "speedup": no_g / full})
        rows.append({"experiment": f"op-fusion {qname}", "on_s": full,
                     "off_s": no_o, "speedup": no_o / full})

    emit("Ablation (best of 3, seconds)", pd.DataFrame(rows).round(3))
    print(
        "\npaper Fig. 9: dynamic tiling Q2 7.08x / Q7 10.59x; "
        "graph fusion Q7 3.80x / Q8 2.04x; operator fusion ~1.16x"
    )


if __name__ == "__main__":
    main()
