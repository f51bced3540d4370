"""Operator protocol and the tileable (logical) graph (paper Section III-C).

Every Xorbits API is internally an operator implementing three methods:

* ``__call__`` — build the node of the **tileable graph** (logical plan).
  Here that is :meth:`Operator.new_tileable`, invoked by the frontend.
* ``tile`` — expand the node into **chunk graph** nodes. ``tile`` is a
  *generator*: when it needs execution metadata that is missing, it
  ``yield``s the chunks to run (paper Fig. 5b); the dynamic tiler
  executes them, records metadata in the meta service, and resumes the
  generator at the yield point. Static operators simply never yield.
* ``execute_chunk`` — run one chunk's kernel on the single-node backend
  (pandas / NumPy), given the input payloads.
"""
from __future__ import annotations

import itertools
from typing import Any, Generator, Iterable, Optional, Sequence

from ..chunk import ChunkMeta, ChunkNode, new_key
from ..config import EngineConfig, TileStats
from ..graph import DAG
from ..meta import MetaService

_tileable_counter = itertools.count()


class Tileable:
    """A node of the tileable graph: the logical result of one operator.

    ``shape_hint`` etc. are planning-time hints only; authoritative
    metadata comes from the meta service after execution (the whole point
    of dynamic tiling is that hints can be wrong or absent).
    """

    def __init__(
        self,
        op: "Operator",
        inputs: Sequence["Tileable"],
        out_slot: int = 0,
        shape_hint: Optional[tuple] = None,
        columns_hint: Optional[list] = None,
        kind: str = "dataframe",  # "dataframe" | "series" | "tensor" | "scalar"
    ) -> None:
        self.op = op
        self.inputs = list(inputs)
        self.out_slot = out_slot
        self.key = f"t{next(_tileable_counter)}"
        self.shape_hint = shape_hint
        self.columns_hint = columns_hint
        self.kind = kind
        self.chunks: Optional[list[ChunkNode]] = None  # set by the tiler

    def __repr__(self) -> str:  # pragma: no cover - debug aid
        return f"<Tileable {self.key} {type(self.op).__name__}[{self.out_slot}]>"


class Operator:
    """Base class for all operators.

    Subclasses set ``output_count`` and implement :meth:`tile` and
    :meth:`execute_chunk`. Chunk-level (staged) operators — e.g.
    ``GroupByAgg`` at stage "map" — are separate lightweight instances
    created inside ``tile``; only :meth:`execute_chunk` is called on
    them.
    """

    output_count = 1
    #: set on chunk-level ops across whose *incoming* edges graph-level
    #: fusion must not fuse (shuffle reducers gather from many mappers).
    no_fuse_in = False
    #: set on chunk-level ops across whose *outgoing* edges fusion must
    #: not fuse (shuffle mappers scatter to many reducers).
    no_fuse_out = False
    #: stage label for staged chunk ops ("map" / "combine" / "reduce"...)
    stage: Optional[str] = None
    #: chunk-level elementwise ops eligible for operator-level fusion
    elementwise = False

    # -- tileable level -------------------------------------------------
    def new_tileable(self, inputs: Sequence[Tileable], **tileable_kw) -> Tileable:
        assert self.output_count == 1
        self.outputs = [Tileable(self, inputs, 0, **tileable_kw)]
        return self.outputs[0]

    def new_tileables(
        self, inputs: Sequence[Tileable], kws: Sequence[dict]
    ) -> list[Tileable]:
        assert len(kws) == self.output_count
        self.outputs = [
            Tileable(self, inputs, slot, **kw) for slot, kw in enumerate(kws)
        ]
        return list(self.outputs)

    # -- chunk level ----------------------------------------------------
    def tile(
        self, ctx: "TileContext"
    ) -> "Generator[list[ChunkNode], None, list[list[ChunkNode]]] | list[list[ChunkNode]]":
        """Expand into chunks.

        Returns one chunk list per output slot (so a single-output op
        returns ``[chunks]``). May be implemented as a generator that
        yields chunk lists to request their execution (dynamic tiling).
        """
        raise NotImplementedError(type(self).__name__)

    def execute_chunk(self, inputs: list[Any], chunk: ChunkNode) -> Any:
        """Compute the payload of ``chunk`` from its input payloads."""
        raise NotImplementedError(type(self).__name__)

    # -- optimizer hooks ------------------------------------------------
    def required_input_columns(
        self, required_out: Optional[set]
    ) -> Optional[list[Optional[set]]]:
        """Column-pruning hook: given the columns required of this op's
        output (``None`` = all), return per-input required column sets
        (``None`` entries = all columns of that input). Default:
        unknown → require everything."""
        return None

    def new_chunk(
        self,
        op: "Operator",
        inputs: list[ChunkNode],
        index: tuple = (0, 0),
        **meta_kw,
    ) -> ChunkNode:
        return ChunkNode(op=op, inputs=inputs, index=index, meta=ChunkMeta(**meta_kw))


def build_tileable_dag(targets: Iterable[Tileable]) -> DAG[Tileable]:
    dag: DAG[Tileable] = DAG()
    stack = list(targets)
    seen: set[str] = set()
    while stack:
        t = stack.pop()
        if t.key in seen:
            continue
        seen.add(t.key)
        dag.add_node(t)
        for inp in t.inputs:
            dag.add_edge(inp, t)
            stack.append(inp)
    return dag


class TileContext:
    """Everything an operator's ``tile`` needs: config, the meta service,
    the already-tiled input chunks, and tiling statistics."""

    def __init__(
        self,
        cfg: EngineConfig,
        meta: MetaService,
        stats: Optional[TileStats] = None,
    ) -> None:
        self.cfg = cfg
        self.meta = meta
        self.stats = stats or TileStats()
        self.op: Optional[Operator] = None  # set by the tiler per op

    def input_chunks(self, slot: int = 0) -> list[ChunkNode]:
        """Chunks of the current op's ``slot``-th input tileable."""
        t = self.op.outputs[0].inputs[slot]
        assert t.chunks is not None, f"input {t} not yet tiled"
        return t.chunks

    # -- metadata helpers used by dynamic operators ---------------------
    def known(self, chunks: Iterable[ChunkNode]) -> bool:
        return self.meta.known(chunks)

    def nbytes(self, chunks: Iterable[ChunkNode]) -> Optional[int]:
        return self.meta.total_nbytes(chunks)

    def chunk_meta(self, chunk: ChunkNode) -> Optional[ChunkMeta]:
        return self.meta.get(chunk.key)

    def refresh(self, chunks: Iterable[ChunkNode]) -> None:
        for c in chunks:
            self.meta.update_chunk(c)


def run_tile(op: Operator, ctx: TileContext, execute_cb) -> list[list[ChunkNode]]:
    """Drive one operator's ``tile``, servicing its yields.

    ``execute_cb(chunks)`` must execute the chunks (and any unexecuted
    ancestors) and record their metadata in the meta service. This is
    the switch between graph construction and graph execution that the
    paper's Fig. 5a depicts.
    """
    ctx.op = op
    result = op.tile(ctx)
    if isinstance(result, Generator):
        gen = result
        try:
            request = next(gen)
            while True:
                ctx.stats.yields += 1
                ctx.stats.probe_executions += len(request)
                execute_cb(request)
                ctx.refresh(request)
                request = gen.send(None)
        except StopIteration as stop:
            result = stop.value
    assert result is not None, f"{type(op).__name__}.tile returned no chunks"
    return result
