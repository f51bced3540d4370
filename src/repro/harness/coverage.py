"""API-coverage benchmark — reproduces paper Table V.

30 asv-style pandas test cases, weighted toward ``groupby``, ``merge``
and ``pivot`` ("the most popular operators" per the Auto-Suggest
notebook corpus the paper cites). Each case runs on every engine and is
checked against the pandas reference result; a case *passes* only if it
runs AND returns the same data. Coverage rate = passes / 30.

Engines (mirroring the paper's Table V columns):

* **xorbits** — our lazy frontend (the reproduction's own API surface);
* **modin** — pandas behind the Modin gap shim (Modin's execution is
  pandas-semantics by design; only its documented gaps differ);
* **dask** — pandas behind the Dask gap shim (documented unsupported
  APIs raise, as they would in ported code);
* **pyspark** — the REAL ``pyspark.pandas``.
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Callable, Optional

import numpy as np
import pandas as pd


def _base_frames(seed: int = 7, n: int = 400) -> dict[str, pd.DataFrame]:
    g = np.random.default_rng(seed)
    left = pd.DataFrame(
        {
            "k": g.integers(0, 20, n),
            "k2": g.choice(list("abcd"), n),
            "v": g.random(n).round(4),
            "w": g.integers(0, 100, n).astype("float64"),
        }
    )
    right = pd.DataFrame(
        {
            "k": np.arange(20),
            "k2": list("abcd") * 5,
            "name": [f"n{i}" for i in range(20)],
            "v": g.random(20).round(4),
        }
    )
    wide = pd.DataFrame(
        {
            "row": np.repeat(np.arange(8), 3),
            "col": list("xyz") * 8,
            "val": g.random(24).round(4),
        }
    )
    return {"left": left, "right": right, "wide": wide}


@dataclass
class Case:
    name: str
    group: str  # groupby | merge | pivot | misc
    fn: Callable  # frames dict -> result


def _c(name, group, fn) -> Case:
    return Case(name, group, fn)


CASES: list[Case] = [
    # ---- groupby (12) ----
    _c("gb_sum_dict", "groupby", lambda t: t["left"].groupby("k").agg({"v": "sum"})),
    _c("gb_multi_key", "groupby",
       lambda t: t["left"].groupby(["k", "k2"]).agg({"v": "mean"})),
    _c("gb_named_tuple", "groupby",
       lambda t: t["left"].groupby("k").agg(total=("v", "sum"), hi=("w", "max"))),
    _c("gb_namedagg_class", "groupby",
       lambda t: t["left"].groupby("k").agg(
           total=pd.NamedAgg(column="v", aggfunc="sum"))),
    _c("gb_dict_multi_func", "groupby",
       lambda t: t["left"].groupby("k").agg({"v": ["sum", "mean"]})),
    _c("gb_size", "groupby", lambda t: t["left"].groupby("k").size()),
    _c("gb_count", "groupby",
       lambda t: t["left"][["k", "v", "w"]].groupby("k").count()),
    _c("gb_median", "groupby",
       lambda t: t["left"].groupby("k").agg({"v": "median"})),
    _c("gb_nunique", "groupby",
       lambda t: t["left"].groupby("k2").agg({"k": "nunique"})),
    _c("gb_series_agg", "groupby",
       lambda t: t["left"].groupby("k")["v"].agg("sum")),
    _c("gb_apply", "groupby",
       lambda t: t["left"].groupby("k").apply(
           lambda gr: (gr["v"] * gr["w"]).sum())),
    _c("gb_transform", "groupby",
       lambda t: t["left"].groupby("k")["v"].transform("sum")),
    # ---- merge (9) ----
    _c("merge_inner", "merge", lambda t: t["left"].merge(t["right"], on="k")),
    _c("merge_left", "merge",
       lambda t: t["left"].merge(t["right"], on="k", how="left")),
    _c("merge_right", "merge",
       lambda t: t["left"].merge(t["right"], on="k", how="right")),
    _c("merge_lr_on", "merge",
       lambda t: t["left"].merge(
           t["right"].rename(columns={"k": "rk"}), left_on="k", right_on="rk")),
    _c("merge_multi_key", "merge",
       lambda t: t["left"].merge(t["right"], on=["k", "k2"])),
    _c("merge_suffixes", "merge",
       lambda t: t["left"].merge(t["right"], on="k", suffixes=("_l", "_r"))),
    _c("merge_sorted_keys", "merge",
       lambda t: t["left"].merge(t["right"], on="k", sort=True)),
    _c("merge_then_groupby", "merge",
       lambda t: t["left"].merge(t["right"][["k", "name"]], on="k")
       .groupby("name").agg({"v": "sum"})),
    _c("merge_self_agg", "merge",
       lambda t: t["left"].merge(
           t["left"].groupby("k").agg(m=("v", "mean")).reset_index(), on="k")),
    # ---- pivot (6) ----
    _c("pivot_table_mean", "pivot",
       lambda t: t["left"].pivot_table(values="v", index="k", columns="k2",
                                       aggfunc="mean")),
    _c("pivot_table_sum", "pivot",
       lambda t: t["left"].pivot_table(values="v", index="k", columns="k2",
                                       aggfunc="sum")),
    _c("pivot_table_count", "pivot",
       lambda t: t["left"].pivot_table(values="v", index="k", columns="k2",
                                       aggfunc="count")),
    _c("pivot_table_fill", "pivot",
       lambda t: t["wide"].pivot_table(values="val", index="row", columns="col",
                                       aggfunc="sum", fill_value=0.0)),
    _c("pivot_table_max", "pivot",
       lambda t: t["left"].pivot_table(values="w", index="k2", columns="k",
                                       aggfunc="max")),
    _c("pivot_wide", "pivot",
       lambda t: t["wide"].pivot(index="row", columns="col", values="val")),
    # ---- misc (3) ----
    _c("value_counts", "misc", lambda t: t["left"]["k"].value_counts()),
    _c("sort_head", "misc",
       lambda t: t["left"].sort_values(["v", "k"], ascending=False).head(10)),
    _c("filter_iloc", "misc", lambda t: t["left"][t["left"]["v"] < 0.5].iloc[5]),
]

assert len(CASES) == 30, len(CASES)


# -- result comparison ------------------------------------------------------


def _meaningless_index(idx: pd.Index) -> bool:
    """A default positional index (unnamed, single-level, integer) carries
    no data — engines differ legitimately in the row labels of e.g. a
    merge result. Named / object / multi-level indexes (group keys,
    value_counts categories, a row Series) are data and are kept."""
    return (
        idx.nlevels == 1
        and idx.name is None
        and getattr(idx, "dtype", None) is not None
        and idx.dtype.kind in "iu"
    )


def _canon(obj) -> pd.DataFrame:
    """Engine-neutral canonical form: values only — frames/series become
    a sorted table; labels/ordering differences engines legitimately
    exhibit (positional row labels, row order) are normalised away."""
    if isinstance(obj, pd.Series):
        obj = (obj.reset_index(drop=True) if _meaningless_index(obj.index)
               else obj.reset_index())
        if isinstance(obj, pd.Series):
            obj = obj.to_frame()
        obj.columns = [f"c{i}" for i in range(obj.shape[1])]
    elif isinstance(obj, pd.DataFrame):
        obj = (obj.reset_index(drop=True) if _meaningless_index(obj.index)
               else obj.reset_index())
        if isinstance(obj.columns, pd.MultiIndex):
            obj.columns = ["|".join(str(x) for x in c if str(x) != "")
                           for c in obj.columns]
        obj.columns = [str(c) for c in obj.columns]
        obj = obj[sorted(obj.columns)]
        obj.columns = [f"c{i}" for i in range(obj.shape[1])]
    else:  # scalar / row
        return pd.DataFrame({"c0": [str(obj)]})
    for c in obj.columns:
        if obj[c].dtype == object:
            obj[c] = obj[c].astype(str)
        elif str(obj[c].dtype).startswith("float"):
            obj[c] = obj[c].round(6)
    return obj.sort_values(list(obj.columns)).reset_index(drop=True)


def _equal(a, b) -> bool:
    try:
        ca, cb = _canon(a), _canon(b)
        if isinstance(a, pd.Series) or isinstance(b, pd.Series):
            pass
        pd.testing.assert_frame_equal(ca, cb, check_dtype=False)
        return True
    except Exception:
        return False


# -- engines ---------------------------------------------------------------


def _pandas_ref(case: Case) -> object:
    return case.fn(_base_frames())


def run_case_xorbits(case: Case, band_budget=None) -> tuple[bool, str]:
    from repro.core.config import EngineConfig
    from repro.frontend import dataframe as xpd
    from repro.frontend.session import XSession

    sess = XSession(EngineConfig(chunk_limit=4_000, n_workers=2,
                                 bands_per_worker=2,
                                 band_memory_limit=band_budget))
    try:
        frames = {k: xpd.from_pandas(v, sess) for k, v in _base_frames().items()}
        out = case.fn(frames)
        if hasattr(out, "to_pandas"):
            out = out.to_pandas()
        ok = _equal(out, _pandas_ref(case))
        return ok, "" if ok else "result mismatch"
    except Exception as exc:  # noqa: BLE001
        return False, f"{type(exc).__name__}: {exc}"
    finally:
        sess.close()


def run_case_shim(case: Case, shim_cls) -> tuple[bool, str]:
    try:
        frames = {k: shim_cls(v) for k, v in _base_frames().items()}
        out = case.fn(frames)
        while hasattr(out, "_shimmed"):
            out = out._df
        ok = _equal(out, _pandas_ref(case))
        return ok, "" if ok else "result mismatch"
    except Exception as exc:  # noqa: BLE001
        return False, f"{type(exc).__name__}: {exc}"


def run_case_pyspark(case: Case) -> tuple[bool, str]:
    import pyspark.pandas as psp

    try:
        frames = {k: psp.from_pandas(v) for k, v in _base_frames().items()}
        out = case.fn(frames)
        if hasattr(out, "to_pandas"):
            out = out.to_pandas()
        ok = _equal(out, _pandas_ref(case))
        return ok, "" if ok else "result mismatch"
    except Exception as exc:  # noqa: BLE001
        return False, f"{type(exc).__name__}: {exc}"


def run_coverage(include_pyspark: bool = True,
                 cases: Optional[list[Case]] = None,
                 verbose: bool = False) -> pd.DataFrame:
    """Run all cases on all engines; returns tidy (engine, case, passed,
    detail) rows. ``table5`` renders the paper's coverage-rate row."""
    from repro.engines.shims import DaskShimFrame, ModinShimFrame

    cases = cases or CASES
    runners = {
        "xorbits": run_case_xorbits,
        "modin": lambda c: run_case_shim(c, ModinShimFrame),
        "dask": lambda c: run_case_shim(c, DaskShimFrame),
    }
    if include_pyspark:
        runners["pyspark"] = run_case_pyspark
    rows = []
    for case in cases:
        for ename, runner in runners.items():
            passed, detail = runner(case)
            rows.append(
                {
                    "engine": ename,
                    "case": case.name,
                    "group": case.group,
                    "passed": passed,
                    "detail": detail[:120],
                }
            )
            if verbose:
                mark = "PASS" if passed else "fail"
                print(f"{case.name:22s} {ename:8s} {mark}  {detail[:70]}")
    return pd.DataFrame(rows)


def table5(results: pd.DataFrame) -> pd.DataFrame:
    """Paper Table V: coverage rate per engine (higher is better)."""
    n_cases = results["case"].nunique()
    rate = results.groupby("engine")["passed"].sum() / n_cases
    order = [e for e in ("xorbits", "modin", "dask", "pyspark") if e in rate.index]
    out = pd.DataFrame({"coverage rate": (rate[order] * 100).round(1)}).T
    return out
