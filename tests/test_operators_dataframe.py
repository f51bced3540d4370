"""Unit tests for dataframe operator helpers and chunk kernels."""
import numpy as np
import pandas as pd
import pytest

from repro.core.operators.dataframe import (
    ALGEBRAIC_FUNCS,
    _AggCombine,
    _AggFinalize,
    _AggMap,
    _concat_parts,
    hash_partition,
    normalize_aggs,
    split_pandas,
)


def frame(n=100, keys=5, seed=0):
    g = np.random.default_rng(seed)
    return pd.DataFrame({"k": g.integers(0, keys, n), "v": g.random(n)})


class TestSplitPandas:
    def test_splits_cover_rows(self):
        df = frame(1000)
        parts = split_pandas(df, 4096)
        assert sum(len(p) for p in parts) == 1000
        assert len(parts) > 1

    def test_single_part_when_fits(self):
        df = frame(10)
        assert len(split_pandas(df, 1 << 30)) == 1

    def test_never_more_parts_than_rows(self):
        df = frame(3)
        assert len(split_pandas(df, 1)) <= 3


class TestHashPartition:
    def test_partition_covers_all_rows(self):
        df = frame(500, keys=50)
        parts = hash_partition(df, ["k"], 8)
        assert sum(len(p) for p in parts.values()) == 500
        assert set(parts) == set(range(8))

    def test_same_key_same_bucket(self):
        df = frame(500, keys=50)
        parts = hash_partition(df, ["k"], 8)
        seen = {}
        for r, p in parts.items():
            for k in p["k"].unique():
                assert seen.setdefault(k, r) == r

    def test_deterministic(self):
        df = frame(200)
        a = hash_partition(df, ["k"], 4)
        b = hash_partition(df, ["k"], 4)
        for r in a:
            pd.testing.assert_frame_equal(a[r], b[r])

    def test_multi_key(self):
        df = frame(300).assign(k2=np.arange(300) % 3)
        parts = hash_partition(df, ["k", "k2"], 4)
        assert sum(len(p) for p in parts.values()) == 300

    def test_total_pads_empty_buckets(self):
        df = frame(100)
        parts = hash_partition(df, ["k"], 2, total=5)
        assert set(parts) == set(range(5))
        assert all(len(parts[r]) == 0 for r in (2, 3, 4))

    def test_single_bucket(self):
        df = frame(50)
        parts = hash_partition(df, ["k"], 1)
        assert len(parts[0]) == 50


class TestNormalizeAggs:
    def test_single_func(self):
        specs, layout = normalize_aggs("sum", {})
        assert specs == [("__all__", None, "sum")]
        assert layout == "flat"

    def test_dict(self):
        specs, layout = normalize_aggs({"v": "sum", "w": "mean"}, {})
        assert specs == [("v", "v", "sum"), ("w", "w", "mean")]

    def test_dict_of_list_is_multiindex(self):
        specs, layout = normalize_aggs({"v": ["sum", "max"]}, {})
        assert layout == "multi"
        assert specs == [("v|sum", "v", "sum"), ("v|max", "v", "max")]

    def test_named_tuple_kwargs(self):
        specs, _ = normalize_aggs(None, {"total": ("v", "sum")})
        assert specs == [("total", "v", "sum")]

    def test_namedagg_kwargs(self):
        specs, _ = normalize_aggs(
            None, {"total": pd.NamedAgg(column="v", aggfunc="sum")}
        )
        assert specs == [("total", "v", "sum")]

    def test_unsupported(self):
        with pytest.raises(TypeError):
            normalize_aggs(3.14, {})

    def test_algebraic_set(self):
        assert {"sum", "mean", "min", "max", "count", "size"} == ALGEBRAIC_FUNCS


class TestAggKernels:
    def test_map_combine_finalize_matches_pandas(self):
        df = frame(1000, keys=7, seed=3)
        specs = [("total", "v", "sum"), ("avg", "v", "mean"),
                 ("n", "v", "size"), ("lo", "v", "min")]
        halves = [df.iloc[:500], df.iloc[500:]]
        partials = [
            _AggMap(["k"], specs).execute_chunk([h], None) for h in halves
        ]
        combined = _AggCombine().execute_chunk(partials, None)
        final = _AggFinalize(["k"], specs, "flat", False).execute_chunk(
            [combined], None
        )
        exp = df.groupby("k").agg(
            total=("v", "sum"), avg=("v", "mean"), n=("v", "size"),
            lo=("v", "min"),
        )
        pd.testing.assert_frame_equal(final, exp, check_dtype=False)

    def test_map_rejects_non_algebraic(self):
        with pytest.raises(ValueError):
            _AggMap(["k"], [("u", "v", "nunique")]).execute_chunk(
                [frame(10)], None
            )


class TestConcatParts:
    def test_skips_empty(self):
        df = frame(10)
        out = _concat_parts([df.iloc[0:0], df, df.iloc[0:0]])
        pd.testing.assert_frame_equal(out, df)

    def test_all_empty_keeps_schema(self):
        df = frame(10)
        out = _concat_parts([df.iloc[0:0], df.iloc[0:0]])
        assert list(out.columns) == list(df.columns)
        assert len(out) == 0

    def test_multiple_nonempty(self):
        df = frame(10)
        out = _concat_parts([df.iloc[:5], df.iloc[5:]])
        assert len(out) == 10
