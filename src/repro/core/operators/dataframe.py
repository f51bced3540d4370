"""DataFrame operators (paper Sections III-C, IV).

Implements the multi-stage map–combine–reduce model for ``groupby.agg``,
the dynamic-tiling paths for ``merge`` (broadcast / shuffle / skew) and
``iloc`` (the paper's 4-8-5 filtered-chunk example), and the 1:1
elementwise operators that graph- and operator-level fusion later merge
into subtasks.

Every operator works in two modes:

* **dynamic** (``cfg.dynamic_tiling``): ``tile`` yields probe chunks,
  reads real metadata from the meta service, and picks the partitioning
  (auto reduce selection, broadcast vs shuffle merge, skew handling).
* **static** (baseline simulators, ablations): no yields; partitioning
  comes from planning-time estimates / fixed policies, reproducing the
  failure modes of Table II.
"""
from __future__ import annotations

import math
from typing import Any, Callable, Optional, Sequence

import numpy as np
import pandas as pd

from ..automerge import plan_merge_groups
from ..chunk import ChunkMeta, ChunkNode, new_key, payload_nbytes
from ..reduce_select import choose_reduce
from .base import Operator, TileContext

# --------------------------------------------------------------------------
# helpers
# --------------------------------------------------------------------------

ALGEBRAIC_FUNCS = {"sum", "count", "min", "max", "mean", "size"}


def split_pandas(pdf: pd.DataFrame, max_bytes: int) -> list[pd.DataFrame]:
    """Row-split ``pdf`` into pieces of at most ~``max_bytes`` each."""
    total = payload_nbytes(pdf)
    n = max(1, math.ceil(total / max(1, max_bytes)))
    n = min(n, max(1, len(pdf)))
    bounds = np.linspace(0, len(pdf), n + 1).astype(int)
    return [pdf.iloc[lo:hi] for lo, hi in zip(bounds[:-1], bounds[1:]) if hi > lo]


def hash_partition(
    pdf: pd.DataFrame, on: list[str], n: int, total: Optional[int] = None
) -> dict[int, pd.DataFrame]:
    """Deterministic hash partitioning on key columns — same function on
    every engine so shuffles are reproducible.

    Every bucket in ``range(total or n)`` is present in the result (empty
    buckets carry a zero-row slice), so downstream reducers always see
    both sides' column structure even when a bucket got no rows.
    """
    total = total if total is not None else n
    if len(pdf) == 0 or n <= 1:
        out = {r: pdf.iloc[0:0] for r in range(total)}
        out[0] = pdf
        return out
    if len(on) == 1:
        h = pd.util.hash_pandas_object(pdf[on[0]], index=False)
    else:
        h = pd.util.hash_pandas_object(
            pdf[on].astype(object).apply(tuple, axis=1), index=False
        )
    codes = (h % n).to_numpy()
    # one stable sort + boundary slicing: O(rows log rows), independent
    # of the bucket count (a per-bucket mask scan is O(rows × buckets))
    order = np.argsort(codes, kind="stable")
    sorted_codes = codes[order]
    bounds = np.searchsorted(sorted_codes, np.arange(total + 1))
    reordered = pdf.iloc[order]
    return {
        r: reordered.iloc[bounds[r]:bounds[r + 1]] for r in range(total)
    }


def _concat_parts(parts: list) -> pd.DataFrame:
    """Concat shuffle parts, skipping empties (they only carry schema)."""
    nonempty = [p for p in parts if len(p)]
    if not nonempty:
        return parts[0]
    if len(nonempty) == 1:
        return nonempty[0]
    return pd.concat(nonempty)


def normalize_aggs(aggs: Any, kwargs: dict) -> tuple[list[tuple[str, Optional[str], str]], str]:
    """Normalize an ``agg`` spec to ``[(out_name, col, func), ...]``.

    Supported inputs (same surface the paper's coverage benchmark uses):
    a single func name, ``{col: func}``, ``{col: [funcs]}``, and NamedAgg
    kwargs ``out=(col, func)``. Returns the normalized list plus an
    output layout tag: "flat" (plain columns) or "multi" (pandas-style
    MultiIndex columns, produced by dict-of-list specs).
    """
    out: list[tuple[str, Optional[str], str]] = []
    layout = "flat"
    if kwargs:
        for out_name, spec in kwargs.items():
            if isinstance(spec, tuple):
                col, func = spec
            else:  # pd.NamedAgg
                col, func = spec.column, spec.aggfunc
            out.append((out_name, col, func))
        return out, layout
    if isinstance(aggs, str):
        return [("__all__", None, aggs)], "flat"
    if isinstance(aggs, dict):
        for col, spec in aggs.items():
            if isinstance(spec, (list, tuple)):
                layout = "multi"
                for f in spec:
                    out.append((f"{col}|{f}", col, f))
            else:
                out.append((col, col, spec))
        return out, layout
    raise TypeError(f"unsupported agg spec: {aggs!r}")


# --------------------------------------------------------------------------
# data sources
# --------------------------------------------------------------------------


class DataChunk(Operator):
    """Chunk-level holder of an in-memory pandas slice (source chunk)."""

    def __init__(self, data: Any) -> None:
        self.data = data

    def execute_chunk(self, inputs, chunk):
        return self.data


class ParquetChunk(Operator):
    """Chunk-level reader of one row-group range of a parquet file."""

    def __init__(self, path: str, row_groups: list[int], columns: Optional[list]) -> None:
        self.path = path
        self.row_groups = row_groups
        self.columns = columns

    def execute_chunk(self, inputs, chunk):
        import pyarrow.parquet as pq

        f = pq.ParquetFile(self.path)
        table = f.read_row_groups(self.row_groups, columns=self.columns)
        return table.to_pandas()


class FromPandas(Operator):
    """Tileable source over an in-memory pandas DataFrame/Series."""

    def __init__(self, pdf: Any, chunk_bytes: Optional[int] = None) -> None:
        self.pdf = pdf
        self.chunk_bytes = chunk_bytes
        self.pruned_columns: Optional[list] = None  # set by column pruning

    def tile(self, ctx: TileContext):
        pdf = self.pdf
        if self.pruned_columns is not None and isinstance(pdf, pd.DataFrame):
            # the pruner is conservative about suffixed/derived names;
            # keep only columns the source actually has
            keep = [c for c in pdf.columns if c in set(self.pruned_columns)]
            pdf = pdf[keep]
        limit = self.chunk_bytes or ctx.cfg.chunk_limit
        if isinstance(pdf, pd.Series):
            pieces = [
                p["__s__"].rename(pdf.name)
                for p in split_pandas(pdf.to_frame("__s__"), limit)
            ]
        else:
            pieces = split_pandas(pdf, limit)
        chunks = [
            ChunkNode(op=DataChunk(p), inputs=[], index=(i, 0),
                      meta=ChunkMeta.from_payload(p))
            for i, p in enumerate(pieces)
        ]
        return [chunks]

    def required_input_columns(self, required_out):
        return []


class ReadParquet(Operator):
    """Tileable parquet reader; chunks follow row groups, grouped so each
    chunk stays under the chunk limit (the paper's ``ReadParquet``)."""

    def __init__(self, path: str, columns: Optional[list] = None) -> None:
        self.path = path
        self.columns = columns
        self.pruned_columns: Optional[list] = None

    def tile(self, ctx: TileContext):
        import pyarrow.parquet as pq

        cols = self.pruned_columns if self.pruned_columns is not None else self.columns
        f = pq.ParquetFile(self.path)
        if cols is not None:
            avail = set(f.schema_arrow.names)
            cols = [c for c in cols if c in avail]
        n_rg = f.metadata.num_row_groups
        total_bytes = sum(
            f.metadata.row_group(i).total_byte_size for i in range(n_rg)
        ) or 1
        # group row groups so each chunk ~<= chunk_limit (decompressed
        # pandas bytes run bigger than parquet bytes; 2x fudge)
        limit = max(1, ctx.cfg.chunk_limit // 2)
        groups: list[list[int]] = []
        cur: list[int] = []
        cur_bytes = 0
        for i in range(n_rg):
            sz = f.metadata.row_group(i).total_byte_size
            if cur and cur_bytes + sz > limit:
                groups.append(cur)
                cur, cur_bytes = [], 0
            cur.append(i)
            cur_bytes += sz
        if cur:
            groups.append(cur)
        chunks = [
            ChunkNode(op=ParquetChunk(self.path, g, cols), inputs=[], index=(i, 0))
            for i, g in enumerate(groups)
        ]
        return [chunks]

    def required_input_columns(self, required_out):
        return []


# --------------------------------------------------------------------------
# 1:1 elementwise / projection / filter
# --------------------------------------------------------------------------


class Elementwise(Operator):
    """A 1:1 operator applying ``func(*input_payloads)`` per chunk.

    Covers arithmetic, comparisons, boolean logic, ``fillna``,
    ``astype``, accessor methods (``.dt.year``), ``reset_index`` — every
    row-wise op. These are the prime candidates for operator-level
    fusion (Section V-A)."""

    elementwise = True

    def __init__(self, func: Callable, name: str = "elementwise",
                 preserves_shape: bool = True) -> None:
        self.func = func
        self.name = name
        self.preserves_shape = preserves_shape

    def tile(self, ctx: TileContext):
        in_lists = [ctx.input_chunks(i) for i in range(len(self.outputs[0].inputs))]
        n = max(len(l) for l in in_lists)
        for l in in_lists:
            assert len(l) in (1, n), (
                f"{self.name}: misaligned chunking {[len(x) for x in in_lists]}"
            )
        chunks = []
        for i in range(n):
            ins = [l[i] if len(l) == n else l[0] for l in in_lists]
            shape = ins[0].meta.shape if self.preserves_shape else None
            chunks.append(ChunkNode(op=self, inputs=ins, index=(i, 0),
                                    meta=ChunkMeta(shape=shape)))
        return [chunks]

    def execute_chunk(self, inputs, chunk):
        return self.func(*inputs)


class GetItem(Operator):
    """Column projection: ``df[col]`` (series) or ``df[[cols]]``."""

    elementwise = True

    def __init__(self, item: Any) -> None:
        self.item = item

    def tile(self, ctx: TileContext):
        chunks = [
            ChunkNode(op=self, inputs=[c], index=c.index, meta=ChunkMeta())
            for c in ctx.input_chunks(0)
        ]
        return [chunks]

    def execute_chunk(self, inputs, chunk):
        return inputs[0][self.item]

    def required_input_columns(self, required_out):
        cols = self.item if isinstance(self.item, list) else [self.item]
        if required_out is not None and isinstance(self.item, list):
            cols = [c for c in cols if c in required_out]
        return [set(cols)]


class InputRef:
    """Marks an assign value as 'the op's i-th tileable input' (a plain
    int would be ambiguous with a literal scalar assignment)."""

    __slots__ = ("pos",)

    def __init__(self, pos: int) -> None:
        self.pos = pos


class SetColumns(Operator):
    """``df.assign(...)`` / ``df[c] = s`` — df input 0, value inputs after.

    ``values`` entries are either literal scalars or :class:`InputRef`s
    naming the tileable input carrying the column's series.
    """

    elementwise = True

    def __init__(self, names: list[str], values: list[Any]) -> None:
        self.names = names
        self.values = values

    def tile(self, ctx: TileContext):
        in_lists = [ctx.input_chunks(i) for i in range(len(self.outputs[0].inputs))]
        n = len(in_lists[0])
        chunks = []
        for i in range(n):
            ins = [l[i] if len(l) == n else l[0] for l in in_lists]
            chunks.append(ChunkNode(op=self, inputs=ins, index=(i, 0), meta=ChunkMeta()))
        return [chunks]

    def execute_chunk(self, inputs, chunk):
        df = inputs[0].copy(deep=False)
        for name, v in zip(self.names, self.values):
            if isinstance(v, InputRef):
                val = inputs[v.pos]
                if isinstance(val, pd.Series):
                    val = val.values if len(val) == len(df) else val
                df[name] = val
            else:
                df[name] = v
        return df

    def required_input_columns(self, required_out):
        if required_out is None:
            return None
        need0 = set(required_out) - set(self.names)
        # value inputs are series; they need everything they carry
        return [need0] + [None] * (len(self.values))


class Filter(Operator):
    """Boolean-mask row filter ``df[mask]`` — the canonical *non-static*
    operator: its output shape depends on data content (Section IV-A)."""

    elementwise = True

    def tile(self, ctx: TileContext):
        df_chunks = ctx.input_chunks(0)
        mask_chunks = ctx.input_chunks(1)
        assert len(df_chunks) == len(mask_chunks), "filter mask misaligned"
        chunks = [
            ChunkNode(op=self, inputs=[d, m], index=d.index, meta=ChunkMeta())
            for d, m in zip(df_chunks, mask_chunks)
        ]
        return [chunks]

    def execute_chunk(self, inputs, chunk):
        df, mask = inputs
        return df[np.asarray(mask, dtype=bool)]

    def required_input_columns(self, required_out):
        return [set(required_out) if required_out is not None else None, None]


class Rename(Operator):
    elementwise = True

    def __init__(self, columns: dict) -> None:
        self.columns = columns

    def tile(self, ctx: TileContext):
        chunks = [
            ChunkNode(op=self, inputs=[c], index=c.index, meta=ChunkMeta(shape=c.meta.shape))
            for c in ctx.input_chunks(0)
        ]
        return [chunks]

    def execute_chunk(self, inputs, chunk):
        obj = inputs[0]
        if isinstance(obj, pd.Series):
            return obj.rename(self.columns) if not isinstance(self.columns, dict) else obj
        return obj.rename(columns=self.columns)

    def required_input_columns(self, required_out):
        if required_out is None:
            return None
        inv = {v: k for k, v in self.columns.items()}
        return [{inv.get(c, c) for c in required_out}]


# --------------------------------------------------------------------------
# concat / iloc / head  (iterative tiling)
# --------------------------------------------------------------------------


class ConcatChunks(Operator):
    """Chunk-level concat of its inputs (axis 0) — the paper's ``Concat``
    node in the combine stage and in auto merge."""

    def __init__(self, axis: int = 0) -> None:
        self.axis = axis

    def execute_chunk(self, inputs, chunk):
        if len(inputs) == 1:
            return inputs[0]
        if all(isinstance(x, pd.Series) for x in inputs):
            return pd.concat(inputs, axis=self.axis)
        return pd.concat(inputs, axis=self.axis)


class Concat(Operator):
    """Tileable-level row concat of several frames."""

    def tile(self, ctx: TileContext):
        chunks = []
        r = 0
        for i in range(len(self.outputs[0].inputs)):
            for c in ctx.input_chunks(i):
                chunks.append(ChunkNode(op=_Identity(), inputs=[c], index=(r, 0),
                                        meta=ChunkMeta(shape=c.meta.shape)))
                r += 1
        return [chunks]


class _Identity(Operator):
    elementwise = True

    def execute_chunk(self, inputs, chunk):
        return inputs[0]


class ILocChunk(Operator):
    """Chunk-level positional slice/pick."""

    def __init__(self, item: Any) -> None:
        self.item = item

    def execute_chunk(self, inputs, chunk):
        return inputs[0].iloc[self.item]


class ILoc(Operator):
    """Positional row access — the paper's iterative-tiling showcase.

    With dynamic tiling, the chunk lengths of the (possibly filtered)
    input are unknown: we ``yield`` the input chunks, read their real
    lengths from the meta service, and then attach an ``ILocChunk`` to
    exactly the chunk(s) containing the requested rows (Fig. 3c:
    lengths 4, 8, 5 → row 10 lives in chunk 2). Without dynamic tiling
    everything is concatenated onto one node first — the baseline
    behaviour that either OOMs or is simply unsupported (Dask).
    """

    def __init__(self, item: Any) -> None:
        self.item = item
        if not isinstance(item, (int, slice)):
            raise TypeError("iloc supports an int or a slice of rows")

    def tile(self, ctx: TileContext):
        in_chunks = ctx.input_chunks(0)

        def lengths_known() -> bool:
            return all(
                c.meta.shape is not None and c.meta.shape[0] is not None
                for c in in_chunks
            )

        if not lengths_known():
            if ctx.cfg.dynamic_tiling:
                yield in_chunks  # iterative tiling: execute, then resume
                ctx.refresh(in_chunks)
                # a chunk may legitimately produce no payload (an empty
                # shuffle bucket): treat it as zero rows
                for c in in_chunks:
                    if c.meta.shape is None:
                        c.meta = ChunkMeta(shape=(0,), nbytes=0)
            else:
                # static fallback: single-node concat + iloc
                gather = ChunkNode(op=ConcatChunks(), inputs=list(in_chunks),
                                   index=(0, 0), meta=ChunkMeta())
                out = ChunkNode(op=ILocChunk(self.item), inputs=[gather],
                                index=(0, 0), meta=ChunkMeta())
                return [[out]]
        lengths = [c.meta.shape[0] for c in in_chunks]
        offsets = np.cumsum([0] + lengths)
        total = int(offsets[-1])
        if isinstance(self.item, int):
            pos = self.item if self.item >= 0 else total + self.item
            if not 0 <= pos < total:
                raise IndexError(f"iloc index {self.item} out of bounds ({total} rows)")
            ci = int(np.searchsorted(offsets, pos, side="right") - 1)
            local = pos - int(offsets[ci])
            out = ChunkNode(op=ILocChunk(local), inputs=[in_chunks[ci]],
                            index=(0, 0), meta=ChunkMeta())
            return [[out]]
        # slice
        start, stop, step = self.item.indices(total)
        chunks = []
        r = 0
        for ci, (lo, hi) in enumerate(zip(offsets[:-1], offsets[1:])):
            s = max(start, int(lo))
            e = min(stop, int(hi))
            if s >= e:
                continue
            local = slice(s - int(lo), e - int(lo), step)
            chunks.append(ChunkNode(op=ILocChunk(local), inputs=[in_chunks[ci]],
                                    index=(r, 0), meta=ChunkMeta()))
            r += 1
        if not chunks:
            empty = ChunkNode(op=ILocChunk(slice(0, 0)), inputs=[in_chunks[0]],
                              index=(0, 0), meta=ChunkMeta())
            chunks = [empty]
        return [chunks]


class Head(ILoc):
    """``df.head(n)`` — an iloc slice."""

    def __init__(self, n: int) -> None:
        super().__init__(slice(0, n))


# --------------------------------------------------------------------------
# groupby.agg — map / combine / reduce with auto reduce selection
# --------------------------------------------------------------------------


class _AggMap(Operator):
    """Map stage: per-chunk partial aggregation (algebraic funcs are
    decomposed, e.g. mean → sum + count)."""

    stage = "map"

    def __init__(self, keys: list[str], specs: list[tuple], series_name=None) -> None:
        self.keys = keys
        self.specs = specs  # normalized (out, col, func)
        self.series_name = series_name

    def execute_chunk(self, inputs, chunk):
        df = inputs[0]
        if isinstance(df, pd.Series):
            df = df.to_frame(self.series_name or df.name or "__val__")
        g = df.groupby(self.keys, sort=False, observed=True)
        parts = {}
        for i, (_out, col, func) in enumerate(self.specs):
            src = g[col] if col is not None else g[df.columns.difference(self.keys)[0]]
            if func == "mean":
                parts[f"{i}__sum"] = src.sum()
                parts[f"{i}__count"] = src.count()
            elif func == "size":
                parts[f"{i}__size"] = g.size()
            elif func in ("sum", "count", "min", "max"):
                parts[f"{i}__{func}"] = getattr(src, func)()
            else:
                raise ValueError(f"non-algebraic func in tree path: {func}")
        return pd.DataFrame(parts)


_PART_COMBINER = {"sum": "sum", "count": "sum", "size": "sum", "min": "min", "max": "max"}


class _AggCombine(Operator):
    """Combine stage: merge a subset of partial results (pre-aggregation
    that keeps any one node's gather small — paper Section III-C)."""

    stage = "combine"
    no_fuse_in = True

    def execute_chunk(self, inputs, chunk):
        df = pd.concat(inputs)
        how = {c: _PART_COMBINER[c.rsplit("__", 1)[1]] for c in df.columns}
        return df.groupby(level=list(range(df.index.nlevels)), sort=False).agg(how)


class _AggFinalize(Operator):
    """Reduce stage of the tree path: combine + finalize to user columns."""

    stage = "agg"
    no_fuse_in = True

    def __init__(self, keys, specs, layout: str, single_func: bool) -> None:
        self.keys = keys
        self.specs = specs
        self.layout = layout
        self.single_func = single_func

    def execute_chunk(self, inputs, chunk):
        df = pd.concat(inputs)
        how = {c: _PART_COMBINER[c.rsplit("__", 1)[1]] for c in df.columns}
        df = df.groupby(level=list(range(df.index.nlevels)), sort=True).agg(how)
        out = {}
        for i, (out_name, _col, func) in enumerate(self.specs):
            if func == "mean":
                out[out_name] = df[f"{i}__sum"] / df[f"{i}__count"]
            elif func == "size":
                out[out_name] = df[f"{i}__size"]
            else:
                out[out_name] = df[f"{i}__{func}"]
        res = pd.DataFrame(out)
        if self.layout == "multi":
            res.columns = pd.MultiIndex.from_tuples(
                [tuple(n.split("|", 1)) for n in res.columns]
            )
        res.index.names = self.keys
        return res


class _AggShuffleMap(Operator):
    """Shuffle-reduce map stage: partial-agg (algebraic) or raw rows
    (general funcs), hash-split by group key into reducer buckets."""

    stage = "map"
    no_fuse_out = True

    def __init__(self, keys, specs, n_reducers: int, algebraic: bool,
                 series_name=None) -> None:
        self.keys = keys
        self.specs = specs
        self.n_reducers = n_reducers
        self.algebraic = algebraic
        self.series_name = series_name

    def execute_chunk(self, inputs, chunk):
        df = inputs[0]
        if isinstance(df, pd.Series):
            df = df.to_frame(self.series_name or df.name or "__val__")
        if self.algebraic:
            partial = _AggMap(self.keys, self.specs, self.series_name).execute_chunk(
                [df], chunk
            )
            flat = partial.reset_index()
        else:
            flat = df
        return hash_partition(flat, self.keys, self.n_reducers)


class _AggShuffleReduce(Operator):
    """Shuffle-reduce reduce stage: gather this reducer's blocks, final
    aggregate with full pandas semantics (supports non-algebraic funcs
    like ``nunique`` / ``median``)."""

    stage = "agg"
    no_fuse_in = True

    def __init__(self, keys, specs, reducer: int, layout: str, algebraic: bool) -> None:
        self.keys = keys
        self.specs = specs
        self.reducer = reducer
        self.layout = layout
        self.algebraic = algebraic

    def execute_chunk(self, inputs, chunk):
        blocks = [b[self.reducer] for b in inputs if self.reducer in b]
        df = _concat_parts(blocks)
        if self.algebraic:
            df = df.set_index(self.keys)
            fin = _AggFinalize(self.keys, self.specs, self.layout, False)
            return fin.execute_chunk([df], chunk)
        g = df.groupby(self.keys, sort=True, observed=True)
        out = {}
        for out_name, col, func in self.specs:
            src = g[col] if col is not None else g
            out[out_name] = src.size() if func == "size" else src.agg(func)
        res = pd.DataFrame(out)
        if self.layout == "multi":
            res.columns = pd.MultiIndex.from_tuples(
                [tuple(n.split("|", 1)) for n in res.columns]
            )
        res.index.names = self.keys
        return res


class GroupByAgg(Operator):
    """``df.groupby(keys).agg(...)`` with the paper's multi-stage model
    and auto reduce selection (Section IV-C, Fig. 6a)."""

    def __init__(self, keys: list[str], aggs: Any = None, agg_kwargs: dict = None,
                 series_name=None) -> None:
        self.keys = list(keys)
        self.specs, self.layout = normalize_aggs(aggs, agg_kwargs or {})
        self.series_name = series_name
        self.algebraic = all(f in ALGEBRAIC_FUNCS for _, _, f in self.specs)

    def tile(self, ctx: TileContext):
        cfg = ctx.cfg
        in_chunks = ctx.input_chunks(0)
        specs = self._resolved_specs(ctx)

        probe_meta = None
        if cfg.dynamic_tiling and self.algebraic:
            # Run the map stage on the first few chunks to observe the
            # aggregation ratio (paper Fig. 5): build a temporary chunk
            # graph, yield it for execution, read back real sizes. The
            # probed *inputs* are requested too — they are fused
            # intermediates otherwise, and the ratio needs their size.
            k = min(cfg.probe_chunks, len(in_chunks))
            probes = [
                ChunkNode(op=_AggMap(self.keys, specs, self.series_name),
                          inputs=[c], index=(i, 0), meta=ChunkMeta())
                for i, c in enumerate(in_chunks[:k])
            ]
            yield probes + list(in_chunks[:k])
            ctx.refresh(probes)
            ctx.refresh(in_chunks)
            probe_meta = (probes, in_chunks[:k])

        mode, n_reducers, est_out = choose_reduce(
            ctx, in_chunks, probe_meta, algebraic=self.algebraic
        )
        ctx.stats.reduce_choices[type(self).__name__ + ":" + ",".join(self.keys)] = mode

        if mode == "tree":
            maps = []
            if probe_meta is not None:
                maps.extend(probe_meta[0])
                rest = in_chunks[len(probe_meta[0]):]
            else:
                rest = in_chunks
            maps.extend(
                ChunkNode(op=_AggMap(self.keys, specs, self.series_name),
                          inputs=[c], index=(len(maps) + i, 0), meta=ChunkMeta())
                for i, c in enumerate(rest)
            )
            level = maps
            while len(level) > cfg.combine_factor:
                groups = plan_merge_groups(ctx, level, cfg.combine_factor)
                ctx.stats.auto_merges += sum(1 for g in groups if len(g) > 1)
                level = [
                    ChunkNode(op=_AggCombine(), inputs=g, index=(i, 0), meta=ChunkMeta())
                    if len(g) > 1 else g[0]
                    for i, g in enumerate(groups)
                ]
            out = ChunkNode(
                op=_AggFinalize(self.keys, specs, self.layout, False),
                inputs=level, index=(0, 0), meta=ChunkMeta(),
            )
            return [[out]]

        # shuffle-reduce
        maps = [
            ChunkNode(op=_AggShuffleMap(self.keys, specs, n_reducers,
                                        self.algebraic, self.series_name),
                      inputs=[c], index=(i, 0), meta=ChunkMeta())
            for i, c in enumerate(in_chunks)
        ]
        reducers = [
            ChunkNode(op=_AggShuffleReduce(self.keys, specs, r, self.layout,
                                           self.algebraic),
                      inputs=list(maps), index=(r, 0), meta=ChunkMeta())
            for r in range(n_reducers)
        ]
        return [reducers]

    def _resolved_specs(self, ctx: TileContext):
        """Resolve ``agg('sum')``-style whole-frame specs against the
        input's known columns."""
        if not any(col is None and out == "__all__" for out, col, _ in self.specs):
            return self.specs
        in_chunks = ctx.input_chunks(0)
        cols = None
        for c in in_chunks:
            if c.meta.columns:
                cols = c.meta.columns
                break
        if cols is None:
            hint = self.outputs[0].inputs[0].columns_hint
            cols = hint
        resolved = []
        for out, col, func in self.specs:
            if col is None and out == "__all__":
                if cols is None:
                    # series groupby: single unnamed value column
                    name = self.series_name or "__val__"
                    resolved.append((name, name, func))
                else:
                    for c in cols:
                        if c not in self.keys:
                            resolved.append((c, c, func))
            else:
                resolved.append((out, col, func))
        return resolved

    def required_input_columns(self, required_out):
        cols = set(self.keys)
        for _out, col, _f in self.specs:
            if col is not None:
                cols.add(col)
            else:
                return [None]
        return [cols]


# --------------------------------------------------------------------------
# merge — broadcast / shuffle / skew-aware shuffle
# --------------------------------------------------------------------------


class _MergeKw:
    def __init__(self, on=None, left_on=None, right_on=None, how="inner",
                 suffixes=("_x", "_y")):
        self.on = on
        self.left_on = left_on or on
        self.right_on = right_on or on
        self.how = how
        self.suffixes = suffixes

    def left_keys(self) -> list[str]:
        k = self.left_on
        return list(k) if isinstance(k, (list, tuple)) else [k]

    def right_keys(self) -> list[str]:
        k = self.right_on
        return list(k) if isinstance(k, (list, tuple)) else [k]

    def pandas_kwargs(self) -> dict:
        if self.on is not None:
            return {"on": self.on, "how": self.how, "suffixes": self.suffixes}
        return {"left_on": self.left_on, "right_on": self.right_on,
                "how": self.how, "suffixes": self.suffixes}


class _MergeBroadcast(Operator):
    """One big-side chunk merged against the whole (concatenated) small
    side — chosen when dynamic tiling observes a tiny build side (the
    TPCx-AI UC10 imbalance case)."""

    stage = "broadcast"

    def __init__(self, kw: _MergeKw, small_side: str) -> None:
        self.kw = kw
        self.small_side = small_side  # "left" | "right"

    def execute_chunk(self, inputs, chunk):
        big, small_parts = inputs[0], inputs[1:]
        small = pd.concat(small_parts) if len(small_parts) > 1 else small_parts[0]
        if self.small_side == "right":
            return big.merge(small, **self.kw.pandas_kwargs())
        return small.merge(big, **self.kw.pandas_kwargs())


class _MergeShuffleMap(Operator):
    stage = "map"
    no_fuse_out = True

    def __init__(self, keys: list[str], n_reducers: int,
                 hot_keys: Optional[frozenset] = None, hot_buckets: int = 0,
                 replicate_hot: bool = False) -> None:
        self.keys = keys
        self.n_reducers = n_reducers
        self.hot_keys = hot_keys
        self.hot_buckets = hot_buckets
        # build side replicates hot rows to every hot bucket; probe side
        # round-robins them
        self.replicate_hot = replicate_hot

    def execute_chunk(self, inputs, chunk):
        df = inputs[0]
        total = self.n_reducers + self.hot_buckets
        if not self.hot_keys:
            return hash_partition(df, self.keys, self.n_reducers, total=total)
        keyvals = (df[self.keys[0]] if len(self.keys) == 1
                   else df[self.keys].astype(object).apply(tuple, axis=1))
        hot_mask = keyvals.isin(self.hot_keys).to_numpy()
        cold = df.iloc[np.flatnonzero(~hot_mask)]
        hot = df.iloc[np.flatnonzero(hot_mask)]
        out = hash_partition(cold, self.keys, self.n_reducers, total=total)
        if len(hot):
            if self.replicate_hot:
                for b in range(self.hot_buckets):
                    r = self.n_reducers + b
                    out[r] = pd.concat([out[r], hot])
            else:
                assign = np.arange(len(hot)) % self.hot_buckets
                for b in range(self.hot_buckets):
                    part = hot.iloc[np.flatnonzero(assign == b)]
                    if len(part):
                        r = self.n_reducers + b
                        out[r] = pd.concat([out[r], part])
        return out


class _MergeShuffleReduce(Operator):
    stage = "reduce"
    no_fuse_in = True

    def __init__(self, kw: _MergeKw, reducer: int, n_left: int) -> None:
        self.kw = kw
        self.reducer = reducer
        self.n_left = n_left  # first n_left inputs are left-side mappers

    def execute_chunk(self, inputs, chunk):
        # Mappers emit every bucket (possibly zero-row) so both sides'
        # column structure is always available here; merging empty sides
        # yields an empty frame with the correct output columns.
        lparts = [b[self.reducer] for b in inputs[: self.n_left] if self.reducer in b]
        rparts = [b[self.reducer] for b in inputs[self.n_left:] if self.reducer in b]
        left = _concat_parts(lparts)
        right = _concat_parts(rparts)
        return left.merge(right, **self.kw.pandas_kwargs())


class Merge(Operator):
    """``df.merge(other)`` with dynamic broadcast/shuffle/skew selection
    (Sections IV-C, VI-B)."""

    def __init__(self, **kwargs) -> None:
        self.kw = _MergeKw(**kwargs)

    def tile(self, ctx: TileContext):
        cfg = ctx.cfg
        left = ctx.input_chunks(0)
        right = ctx.input_chunks(1)
        lkeys, rkeys = self.kw.left_keys(), self.kw.right_keys()

        est_l = est_r = None
        hot_keys: Optional[frozenset] = None
        hot_bytes = 0
        if cfg.dynamic_tiling:
            k = max(1, cfg.probe_chunks)
            probes = [c for c in left[:k] if not ctx.meta.has(c.key)] + [
                c for c in right[:k] if not ctx.meta.has(c.key)
            ]
            if probes:
                yield probes
            ctx.refresh(left)
            ctx.refresh(right)
            est_l = _estimate_total(ctx, left)
            est_r = _estimate_total(ctx, right)
            hot_keys, hot_bytes = _detect_hot_keys(ctx, left, right, lkeys, rkeys)

        # --- broadcast path -------------------------------------------
        if cfg.dynamic_tiling and est_l is not None and est_r is not None:
            small_side = None
            if est_r <= cfg.broadcast_threshold and self.kw.how in ("inner", "left"):
                small_side = "right"
            elif est_l <= cfg.broadcast_threshold and self.kw.how in ("inner", "right"):
                small_side = "left"
            if small_side is not None:
                big, small = (left, right) if small_side == "right" else (right, left)
                op_key = f"merge:{lkeys}/{rkeys}"
                ctx.stats.merge_choices[op_key] = "broadcast"
                chunks = [
                    ChunkNode(op=_MergeBroadcast(self.kw, small_side),
                              inputs=[b] + list(small), index=(i, 0), meta=ChunkMeta())
                    for i, b in enumerate(big)
                ]
                return [chunks]

        # --- shuffle path ---------------------------------------------
        if cfg.dynamic_tiling and est_l is not None and est_r is not None:
            n_red = max(1, math.ceil((est_l + est_r) / cfg.chunk_limit))
        else:
            n_red = cfg.static_shuffle_partitions or max(len(left), len(right))
        hot_buckets = 0
        use_hot = bool(hot_keys) and cfg.dynamic_tiling
        if use_hot:
            hot_buckets = max(1, math.ceil(hot_bytes / cfg.chunk_limit))
            ctx.stats.merge_choices[f"merge:{lkeys}/{rkeys}"] = "skew"
        elif cfg.dynamic_tiling:
            ctx.stats.merge_choices[f"merge:{lkeys}/{rkeys}"] = "shuffle"
        hot_fs = frozenset(hot_keys) if use_hot else None
        # probe side = the preserved/larger side (left for how='left');
        # build side replicates its hot rows to every hot bucket.
        probe_is_left = self.kw.how in ("left", "inner")
        lmaps = [
            ChunkNode(op=_MergeShuffleMap(lkeys, n_red, hot_fs, hot_buckets,
                                          replicate_hot=use_hot and not probe_is_left),
                      inputs=[c], index=(i, 0), meta=ChunkMeta())
            for i, c in enumerate(left)
        ]
        rmaps = [
            ChunkNode(op=_MergeShuffleMap(rkeys, n_red, hot_fs, hot_buckets,
                                          replicate_hot=use_hot and probe_is_left),
                      inputs=[c], index=(i, 0), meta=ChunkMeta())
            for i, c in enumerate(right)
        ]
        total = n_red + hot_buckets
        reducers = [
            ChunkNode(op=_MergeShuffleReduce(self.kw, r, len(lmaps)),
                      inputs=lmaps + rmaps, index=(r, 0), meta=ChunkMeta())
            for r in range(total)
        ]
        return [reducers]

    def required_input_columns(self, required_out):
        if required_out is None:
            return None
        lk, rk = set(self.kw.left_keys()), set(self.kw.right_keys())
        # suffix handling: require base names on both sides conservatively
        base = set()
        for c in required_out:
            base.add(c)
            for s in self.kw.suffixes:
                if s and c.endswith(s):
                    base.add(c[: -len(s)])
        return [base | lk, base | rk]


def _estimate_total(ctx: TileContext, chunks: list[ChunkNode]) -> Optional[int]:
    """Estimated total bytes of a chunk list: exact where metadata is
    recorded, mean-extrapolated for the rest."""
    known = [ctx.meta.get(c.key) for c in chunks]
    sizes = [m.nbytes for m in known if m is not None and m.nbytes is not None]
    if not sizes:
        return None
    mean = sum(sizes) / len(sizes)
    return int(sum(sizes) + mean * (len(chunks) - len(sizes)))


def _detect_hot_keys(ctx, left, right, lkeys, rkeys):
    """Find join keys whose estimated one-reducer bytes exceed the skew
    limit, from the *executed* probe chunks' real key frequencies."""
    cfg = ctx.cfg
    limit = cfg.resolved_skew_key_limit()
    hot: set = set()
    hot_bytes = 0
    for chunks, keys in ((left, lkeys), (right, rkeys)):
        probed = [c for c in chunks if ctx.meta.has(c.key)]
        if not probed:
            continue
        frac = len(probed) / len(chunks)
        counts: dict = {}
        bytes_per_row = None
        for c in probed:
            m = ctx.meta.get(c.key)
            if m.nbytes and m.shape and m.shape[0]:
                bytes_per_row = m.nbytes / m.shape[0]
            payload = ctx.probe_payload(c.key) if hasattr(ctx, "probe_payload") else None
            if payload is None:
                continue
            kv = (payload[keys[0]] if len(keys) == 1
                  else payload[keys].astype(object).apply(tuple, axis=1))
            for k, n in kv.value_counts().head(20).items():
                counts[k] = counts.get(k, 0) + int(n)
        if bytes_per_row is None:
            continue
        for k, n in counts.items():
            est_rows = n / max(frac, 1e-9)
            est_bytes = est_rows * bytes_per_row
            if est_bytes > limit:
                hot.add(k)
                hot_bytes = max(hot_bytes, int(est_bytes))
    return (hot or None), hot_bytes


# --------------------------------------------------------------------------
# sort / dedup / scalar reductions
# --------------------------------------------------------------------------


class _SortChunk(Operator):
    def __init__(self, by, ascending) -> None:
        self.by = by
        self.ascending = ascending

    def execute_chunk(self, inputs, chunk):
        df = pd.concat(inputs) if len(inputs) > 1 else inputs[0]
        if isinstance(df, pd.Series):
            return df.sort_values(ascending=self.ascending)
        return df.sort_values(self.by, ascending=self.ascending, kind="mergesort")


class _RangeSplit(Operator):
    """Range-partition a chunk by sort-key quantile bounds."""

    no_fuse_out = True

    def __init__(self, by, bounds, ascending) -> None:
        self.by = by
        self.bounds = bounds
        self.ascending = ascending

    def execute_chunk(self, inputs, chunk):
        df = inputs[0]
        key = df[self.by[0]] if isinstance(self.by, list) else df[self.by]
        codes = np.searchsorted(self.bounds, key.to_numpy(), side="right")
        if not self.ascending:
            codes = len(self.bounds) - codes
        return {
            r: df.iloc[np.flatnonzero(codes == r)]
            for r in range(len(self.bounds) + 1)
        }


class _RangeSortReduce(Operator):
    no_fuse_in = True

    def __init__(self, by, ascending, reducer) -> None:
        self.by = by
        self.ascending = ascending
        self.reducer = reducer

    def execute_chunk(self, inputs, chunk):
        parts = [b[self.reducer] for b in inputs if self.reducer in b]
        df = _concat_parts(parts)
        return df.sort_values(self.by, ascending=self.ascending, kind="mergesort")


class SortValues(Operator):
    """``df.sort_values`` — single-node sort when the (observed) data is
    small, sample-based range shuffle otherwise."""

    def __init__(self, by, ascending=True) -> None:
        self.by = by if isinstance(by, list) else [by]
        self.ascending = ascending

    def tile(self, ctx: TileContext):
        cfg = ctx.cfg
        in_chunks = ctx.input_chunks(0)
        est = None
        # per-key ascending directions require a global sort; the range
        # shuffle orders on the first key only
        rangeable = not isinstance(self.ascending, (list, tuple))
        if cfg.dynamic_tiling and rangeable:
            probes = [c for c in in_chunks[: cfg.probe_chunks] if not ctx.meta.has(c.key)]
            if probes:
                yield probes
            ctx.refresh(in_chunks)
            est = _estimate_total(ctx, in_chunks)
        if est is None or est <= cfg.chunk_limit or len(in_chunks) == 1:
            out = ChunkNode(op=_SortChunk(self.by, self.ascending),
                            inputs=list(in_chunks), index=(0, 0), meta=ChunkMeta())
            return [[out]]
        n_red = max(1, math.ceil(est / cfg.chunk_limit))
        bounds = self._sample_bounds(ctx, in_chunks, n_red)
        maps = [
            ChunkNode(op=_RangeSplit(self.by, bounds, self.ascending), inputs=[c],
                      index=(i, 0), meta=ChunkMeta())
            for i, c in enumerate(in_chunks)
        ]
        # bucket count must match what the mappers emit: quantile bounds
        # may dedup to fewer splits than requested
        reducers = [
            ChunkNode(op=_RangeSortReduce(self.by, self.ascending, r),
                      inputs=list(maps), index=(r, 0), meta=ChunkMeta())
            for r in range(len(bounds) + 1)
        ]
        return [reducers]

    def _sample_bounds(self, ctx, in_chunks, n_red):
        samples = []
        for c in in_chunks:
            payload = ctx.probe_payload(c.key) if hasattr(ctx, "probe_payload") else None
            if payload is not None and len(payload):
                samples.append(payload[self.by[0]])
        if not samples:
            return np.array([])
        s = pd.concat(samples)
        qs = np.linspace(0, 1, n_red + 1)[1:-1]
        return np.unique(s.quantile(qs, interpolation="nearest").to_numpy())


class _GatherApply(Operator):
    """Gather all input chunks onto one node and apply ``fn`` — the
    implementation of operators whose semantics are inherently global
    (``pivot`` reshapes, final ``value_counts`` ordering). Memory-risky
    by design: this is the operation Dask/Modin refuse; Xorbits supports
    it and the meter charges it honestly."""

    no_fuse_in = True

    def __init__(self, fn: Callable, name: str = "gather") -> None:
        self.fn = fn
        self.name = name

    def execute_chunk(self, inputs, chunk):
        parts = [p for p in inputs if p is not None]
        df = pd.concat(parts) if len(parts) > 1 else parts[0]
        return self.fn(df)


class MapGather(Operator):
    """Tileable op: concat every chunk of the input, apply ``fn``."""

    def __init__(self, fn: Callable, name: str = "gather") -> None:
        self.fn = fn
        self.name = name

    def tile(self, ctx: TileContext):
        out = ChunkNode(
            op=_GatherApply(self.fn, self.name),
            inputs=list(ctx.input_chunks(0)), index=(0, 0), meta=ChunkMeta(),
        )
        return [[out]]


class _DedupMap(Operator):
    stage = "map"

    def __init__(self, subset) -> None:
        self.subset = subset

    def execute_chunk(self, inputs, chunk):
        df = inputs[0]
        if isinstance(df, pd.Series):
            return df.drop_duplicates()
        return df.drop_duplicates(subset=self.subset)


class _DedupReduce(Operator):
    stage = "agg"
    no_fuse_in = True

    def __init__(self, subset) -> None:
        self.subset = subset

    def execute_chunk(self, inputs, chunk):
        df = pd.concat(inputs)
        if isinstance(df, pd.Series):
            return df.drop_duplicates()
        return df.drop_duplicates(subset=self.subset)


class DropDuplicates(Operator):
    """Tree map-dedup → combine-dedup; a non-static operator the paper
    lists explicitly (Section IV-A)."""

    def __init__(self, subset=None) -> None:
        self.subset = subset

    def tile(self, ctx: TileContext):
        cfg = ctx.cfg
        maps = [
            ChunkNode(op=_DedupMap(self.subset), inputs=[c], index=(i, 0),
                      meta=ChunkMeta())
            for i, c in enumerate(ctx.input_chunks(0))
        ]
        level = maps
        while len(level) > cfg.combine_factor:
            groups = [level[i:i + cfg.combine_factor]
                      for i in range(0, len(level), cfg.combine_factor)]
            level = [
                ChunkNode(op=_DedupReduce(self.subset), inputs=g, index=(i, 0),
                          meta=ChunkMeta())
                for i, g in enumerate(groups)
            ]
        out = ChunkNode(op=_DedupReduce(self.subset), inputs=level, index=(0, 0),
                        meta=ChunkMeta())
        return [[out]]

    def required_input_columns(self, required_out):
        if required_out is None or self.subset is None:
            return None
        return [set(required_out) | set(self.subset)]


class _ScalarMap(Operator):
    stage = "map"

    def __init__(self, func: str) -> None:
        self.func = func

    def execute_chunk(self, inputs, chunk):
        s = inputs[0]
        f = self.func
        if f == "mean":
            return (float(s.sum()), int(s.count()))
        if f == "nunique":
            return set(pd.unique(s.dropna()))
        if f == "count":
            return int(s.count())
        if f == "size":
            return int(len(s))
        return getattr(s, f)()


class _ScalarReduce(Operator):
    stage = "agg"
    no_fuse_in = True

    def __init__(self, func: str) -> None:
        self.func = func

    def execute_chunk(self, inputs, chunk):
        f = self.func
        if f == "mean":
            tot = sum(p[0] for p in inputs)
            cnt = sum(p[1] for p in inputs)
            return tot / cnt if cnt else float("nan")
        if f == "nunique":
            out = set()
            for p in inputs:
                out |= p
            return len(out)
        if f in ("sum", "count", "size"):
            return sum(inputs)
        if f == "min":
            return min(inputs)
        if f == "max":
            return max(inputs)
        raise ValueError(f)


class ScalarAgg(Operator):
    """Whole-series reduction to a scalar (``s.sum()``, ``s.mean()``...)."""

    def __init__(self, func: str) -> None:
        self.func = func

    def tile(self, ctx: TileContext):
        maps = [
            ChunkNode(op=_ScalarMap(self.func), inputs=[c], index=(i, 0),
                      meta=ChunkMeta())
            for i, c in enumerate(ctx.input_chunks(0))
        ]
        out = ChunkNode(op=_ScalarReduce(self.func), inputs=maps, index=(0, 0),
                        meta=ChunkMeta())
        return [[out]]
