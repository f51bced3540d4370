"""Data-science pipelines (paper Table III / Fig. 8a).

Three pipelines matching the paper's DS/ML workload roster:

* ``tpcxai_uc10`` — the TPCx-AI use-case-10 shape: a huge, Zipf-skewed
  financial-transaction fact joined against a tiny customer dimension,
  then per-customer feature aggregation. The join is the paper's
  data-imbalance showcase (dynamic tiling broadcasts the 3.2 MB
  dimension; static engines hash-shuffle and collapse onto one reducer).
* ``census`` — filtering, missing-data handling, derived features, and
  per-segment aggregate statistics over a census-like frame.
* ``plasticc`` — per-(object, passband) light-curve features followed by
  per-object roll-ups (includes an ``nunique``, exercising the
  shuffle-reduce path).

Each pipeline is engine-agnostic like the TPC-H queries; correctness is
checked against running the same function on raw pandas.
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Callable

from repro.synth_data import (
    census_pdf,
    plasticc_pdf,
    tpcxai_customers_pdf,
    tpcxai_transactions_pdf,
)


@dataclass
class Pipeline:
    name: str
    fn: Callable
    tables_fn: Callable  # sf -> dict of pandas frames
    description: str


def _uc10(t):
    tx = t["transactions"]
    tx = tx[tx["amount"] > 0]
    j = tx.merge(t["customers"], on="customer_id")  # tiny dim × skewed fact
    j = j.assign(risk_amount=j["amount"] * j["risk_score"])
    feats = (
        j.groupby(["customer_id", "segment"])
        .agg(
            n_tx=("transaction_id", "count"),
            total=("amount", "sum"),
            avg=("amount", "mean"),
            risk=("risk_amount", "sum"),
        )
        .reset_index()
    )
    return feats.sort_values(["risk", "customer_id"], ascending=False).head(50)


def _census(t):
    df = t["census"]
    df = df[(df["age"] >= 18) & (df["workclass"] != "?")]
    df = df.assign(
        has_gain=(df["capital_gain"] > 0).astype("int64"),
        hours_bucket=df["hours_per_week"] // 10,
    )
    out = (
        df.groupby(["workclass", "sex"])
        .agg(
            income_rate=("income_gt_50k", "mean"),
            gain_rate=("has_gain", "mean"),
            avg_hours=("hours_per_week", "mean"),
            avg_edu=("education_num", "mean"),
            n=("age", "size"),
        )
        .reset_index()
    )
    return out.sort_values(["workclass", "sex"])


def _plasticc(t):
    df = t["plasticc"]
    det = df[df["detected"] == 1]
    per = (
        det.groupby(["object_id", "passband"])
        .agg(
            fmax=("flux", "max"),
            fmin=("flux", "min"),
            fmean=("flux", "mean"),
            n=("flux", "count"),
        )
        .reset_index()
    )
    per = per.assign(amp=per["fmax"] - per["fmin"])
    obj = (
        per.groupby("object_id")
        .agg(
            amp_mean=("amp", "mean"),
            flux_mean=("fmean", "mean"),
            n_bands=("passband", "nunique"),
        )
        .reset_index()
    )
    return obj.sort_values("object_id")


PIPELINES: dict[str, Pipeline] = {
    "tpcxai_uc10": Pipeline(
        "tpcxai_uc10",
        _uc10,
        lambda sf: {
            "transactions": tpcxai_transactions_pdf(sf),
            "customers": tpcxai_customers_pdf(sf),
        },
        "TPCx-AI UC10: skewed transactions ⨝ tiny customers + features",
    ),
    "census": Pipeline(
        "census",
        _census,
        lambda sf: {"census": census_pdf(sf)},
        "census: filter + missing-data + derived features + aggregates",
    ),
    "plasticc": Pipeline(
        "plasticc",
        _plasticc,
        lambda sf: {"plasticc": plasticc_pdf(sf)},
        "plasticc: light-curve features per object/passband",
    ),
}
