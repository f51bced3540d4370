"""API-surface shims encoding baseline frameworks' documented gaps.

The paper attributes baseline failures partly to missing pandas APIs
(Table II "API Compatibility" and the Table V coverage benchmark). We
reproduce those gaps as thin wrappers that delegate everything except
the operations the framework documentation (at the paper's versions)
says are unsupported or semantically different:

Dask (2023.9 docs / paper Listing 1):
  * no positional row ``iloc``
  * ``merge(sort=True)`` (sorted join keys) unsupported
  * ``pivot``/``pivot_table`` restricted (modelled as unsupported)
  * ``groupby(...)`` ignores ``sort=True``; ``median`` unsupported
  * ``groupby.transform`` / ``groupby.apply`` need explicit ``meta``
    (modelled as unsupported in drop-in-ported code)

Modin (0.24):
  * near-complete pandas coverage; distributed-unfriendly reshapes fall
    back to pandas — modelled as supported except ``df.pivot`` wide
    reshape of distributed frames.

The wrappers work over any underlying frame type (our lazy frontend for
the failure harness; real pandas for the coverage benchmark) so the gap
model and the execution substrate stay independent.
"""
from __future__ import annotations

from typing import Any


class _ShimBase:
    _shimmed = True
    #: method names that raise NotImplementedError
    _blocked: dict = {}

    def __init__(self, df: Any) -> None:
        self._df = df

    def _wrap(self, value: Any) -> Any:
        # wrap frames only; series pass through so scalar ops keep working
        if hasattr(value, "columns") and hasattr(value, "merge"):
            return type(self)(value)
        return value

    @staticmethod
    def _unwrap(value: Any) -> Any:
        return value._df if isinstance(value, _ShimBase) else value

    def __getattr__(self, name: str) -> Any:
        if name in self._blocked:
            raise NotImplementedError(
                f"{type(self).__name__}: {self._blocked[name]}"
            )
        attr = getattr(self._df, name)
        if name in ("iloc", "loc", "at", "iat"):
            return attr  # indexer objects are subscripted, not called
        if callable(attr):
            def call(*args, **kwargs):
                args = [self._unwrap(a) for a in args]
                kwargs = {k: self._unwrap(v) for k, v in kwargs.items()}
                return self._wrap(attr(*args, **kwargs))

            return call
        return self._wrap(attr)

    def __getitem__(self, item):
        if hasattr(item, "_shimmed"):
            item = item._df
        if hasattr(item, "_df"):
            item = item._df
        return self._wrap(self._df[item])

    def __setitem__(self, key, value):
        if hasattr(value, "_shimmed"):
            value = value._df
        self._df[key] = value

    def __len__(self):
        return len(self._df)


class DaskShimFrame(_ShimBase):
    """Dask DataFrame surface over any backing frame."""

    _blocked = {
        "pivot": "dask does not implement DataFrame.pivot",
        "pivot_table": "dask pivot_table requires category dtype and "
                       "supports only mean/sum/count (modelled unsupported)",
        "transform": "dask groupby/frame transform requires meta=",
    }

    @property
    def iloc(self):
        raise NotImplementedError(
            "dask DataFrame.iloc does not support positional row indexing"
        )

    def merge(self, right, *args, **kwargs):
        if kwargs.pop("sort", False):
            raise NotImplementedError("dask merge does not support sort=True")
        if hasattr(right, "_shimmed"):
            right = right._df
        return self._wrap(self._df.merge(right, *args, **kwargs))

    def sort_values(self, by, *args, **kwargs):
        # dask sorts by a single column only; ported pandas code that
        # sorts a small *final* result post-compute still works, which is
        # how the paper's TPC-H ports ran — so multi-key sorts delegate.
        return self._wrap(self._df.sort_values(by, *args, **kwargs))

    def groupby(self, by, *args, **kwargs):
        return _DaskShimGroupBy(self._df.groupby(by, *args, **kwargs), type(self))


class _DaskShimGroupBy:
    _UNSUPPORTED_FUNCS = {"median"}

    def __init__(self, gb: Any, frame_cls) -> None:
        self._gb = gb
        self._frame_cls = frame_cls

    def __getitem__(self, item):
        return _DaskShimGroupBy(self._gb[item], self._frame_cls)

    def _check(self, arg, kwargs) -> None:
        funcs = []
        if isinstance(arg, str):
            funcs.append(arg)
        elif isinstance(arg, dict):
            for v in arg.values():
                funcs.extend(v if isinstance(v, (list, tuple)) else [v])
        for spec in kwargs.values():
            f = spec[1] if isinstance(spec, tuple) else getattr(spec, "aggfunc", spec)
            funcs.append(f)
        bad = self._UNSUPPORTED_FUNCS & {f for f in funcs if isinstance(f, str)}
        if bad:
            raise NotImplementedError(f"dask groupby does not support {sorted(bad)}")

    def agg(self, arg=None, **kwargs):
        self._check(arg, kwargs)
        return self._frame_cls(self._gb.agg(arg, **kwargs) if arg is not None
                               else self._gb.agg(**kwargs))

    aggregate = agg

    def apply(self, *args, **kwargs):
        raise NotImplementedError("dask groupby.apply requires meta=")

    def transform(self, *args, **kwargs):
        raise NotImplementedError("dask groupby.transform requires meta=")

    def __getattr__(self, name):
        attr = getattr(self._gb, name)
        if callable(attr):
            def call(*args, **kwargs):
                out = attr(*args, **kwargs)
                if hasattr(out, "merge") or hasattr(out, "groupby"):
                    return self._frame_cls(out)
                return out

            return call
        return attr


class ModinShimFrame(_ShimBase):
    """Modin surface: pandas-complete except wide reshapes of
    distributed frames."""

    _blocked = {
        "pivot": "modin falls back / errors on wide pivot of distributed frames",
    }
