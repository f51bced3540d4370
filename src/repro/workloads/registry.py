"""Workload and framework registries — paper Tables III and IV.

Table III in the paper is the workload roster (size, format, workers,
I/O, type); ours regenerates every workload at the benchmark scale and
measures its *real* in-memory bytes. Table IV is the framework/version
roster; ours live-probes the installed packages plus the simulated
engines (with their substitution noted).
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Callable

import pandas as pd


@dataclass
class Workload:
    name: str
    paper_size: str  # what the paper used
    fmt: str
    workers: str
    with_io: bool
    wtype: str  # DS / ML / AP
    tables_fn: Callable  # sf -> dict[str, pd.DataFrame]
    bench_sf: float


def _tpch_tables(sf):
    from repro.synth_data import tpch_tables_pdf

    return tpch_tables_pdf(sf)


def _uc10_tables(sf):
    from repro.synth_data import tpcxai_customers_pdf, tpcxai_transactions_pdf

    return {
        "transactions": tpcxai_transactions_pdf(sf),
        "customers": tpcxai_customers_pdf(sf),
    }


def _census_tables(sf):
    from repro.synth_data import census_pdf

    return {"census": census_pdf(sf)}


def _plasticc_tables(sf):
    from repro.synth_data import plasticc_pdf

    return {"plasticc": plasticc_pdf(sf)}


def _array_placeholder(sf):
    return {}


WORKLOADS: list[Workload] = [
    Workload("TPCx-AI UC10 SF100", "34GB", "CSV", "2", True, "DS, ML",
             _uc10_tables, 0.1),
    Workload("census", "21GB", "CSV", "1", True, "DS, ML", _census_tables, 0.1),
    Workload("plasticc", "20GB", "CSV", "1", True, "DS, ML", _plasticc_tables, 0.1),
    Workload("TPC-H SF100", "36GB", "Parquet", "4", False, "AP",
             _tpch_tables, 0.1),
    Workload("TPC-H SF1000", "358GB", "Parquet", "16", False, "AP",
             _tpch_tables, 0.5),
    Workload("QR", "Scale", "Synthetic", "1-4", True, "DS",
             _array_placeholder, 0.0),
    Workload("Linear Regression", "Scale", "Synthetic", "1-4", True, "DS, ML",
             _array_placeholder, 0.0),
]


def table3(measure: bool = True, sf_override: float = None) -> pd.DataFrame:
    """Render Table III with the paper's sizes next to our measured
    lite-bytes at the benchmark SF (``sf_override`` shrinks every
    workload to one scale — used by fast tests)."""
    rows = []
    for w in WORKLOADS:
        measured = "scale"
        if measure and w.bench_sf > 0:
            tables = w.tables_fn(sf_override or w.bench_sf)
            nbytes = sum(
                int(t.memory_usage(index=True, deep=True).sum())
                for t in tables.values()
            )
            measured = f"{nbytes / (1 << 20):.0f}MB"
        rows.append(
            {
                "Workload": w.name,
                "Paper Size": w.paper_size,
                "Ours (lite)": measured,
                "Format": w.fmt,
                "Workers": w.workers,
                "W/ IO": w.with_io,
                "Type": w.wtype,
            }
        )
    return pd.DataFrame(rows)


def framework_versions() -> pd.DataFrame:
    """Render Table IV: live versions + the substitution notes."""
    import importlib.metadata as md

    def ver(pkg: str) -> str:
        try:
            return md.version(pkg)
        except md.PackageNotFoundError:
            return "n/a"

    rows = [
        {"framework": "NumPy", "version": ver("numpy"), "API": "A",
         "provenance": "real (backend of our Tensor chunks)"},
        {"framework": "pandas", "version": ver("pandas"), "API": "D",
         "provenance": "real (backend of our DataFrame chunks)"},
        {"framework": "Xorbits (repro)", "version": ver("repro"), "API": "A + D",
         "provenance": "this reproduction (paper used 0.6.3)"},
        {"framework": "PySpark", "version": ver("pyspark"), "API": "D",
         "provenance": "real pandas-on-Spark (paper used 3.5.0)"},
        {"framework": "Dask", "version": "sim", "API": "A + D",
         "provenance": "policy simulator (paper used 2023.9; not installable offline)"},
        {"framework": "Modin", "version": "sim", "API": "D",
         "provenance": "policy simulator (paper used 0.24.1; not installable offline)"},
    ]
    return pd.DataFrame(rows)
