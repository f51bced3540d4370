"""The dynamic tiler (paper Section IV, Fig. 5a).

Walks the tileable graph in topological order and drives every
operator's ``tile`` generator. When a generator yields chunks — because
it needs metadata that only execution can supply — the tiler *switches
from graph construction to graph execution*: it submits the partial
chunk graph to the executor, records the resulting metadata in the meta
service, and resumes the generator at the yield point ("iterative
tiling"). With ``cfg.dynamic_tiling`` off, generators never yield and
partitioning falls back to static estimates — the baseline behaviour of
the systems in paper Tables I/II.
"""
from __future__ import annotations

from typing import Iterable, Optional

from .chunk import ChunkNode
from .config import EngineConfig, TileStats
from .executor import BaseExecutor
from .meta import MetaService
from .operators.base import Tileable, TileContext, build_tileable_dag, run_tile
from .pruning import apply_pruning


class _TilerContext(TileContext):
    """TileContext wired to live services: probe payload access comes
    from the storage service (dynamic operators inspect actual data,
    e.g. join-key frequencies for skew detection)."""

    def __init__(self, cfg, meta, storage, stats) -> None:
        super().__init__(cfg, meta, stats)
        self._storage = storage

    def probe_payload(self, key: str):
        return self._storage.get(key) if self._storage.has(key) else None


class GraphTiler:
    """Tiles a tileable graph into chunks, executing probes on demand."""

    def __init__(
        self,
        cfg: EngineConfig,
        meta: MetaService,
        executor: BaseExecutor,
    ) -> None:
        self.cfg = cfg
        self.meta = meta
        self.executor = executor
        self.stats = TileStats()
        self.probe_keys: set[str] = set()

    def tile(self, targets: Iterable[Tileable]) -> None:
        """Tile every not-yet-tiled tileable reachable from ``targets``
        (idempotent: already-tiled nodes keep their chunks, so repeated
        ``run`` calls on a growing graph reuse earlier work — the
        "deferred evaluation" usage mode)."""
        targets = list(targets)
        dag = build_tileable_dag(targets)
        if self.cfg.column_pruning:
            stale = apply_pruning(dag)
            if stale:
                self._invalidate(dag, stale)
        ctx = _TilerContext(self.cfg, self.meta, self.executor.storage, self.stats)

        tiled_ops: set[int] = set()
        for t in dag.topological_order():
            if t.chunks is not None:
                tiled_ops.add(id(t.op))
                continue
            if id(t.op) in tiled_ops:
                continue  # multi-output op already tiled via sibling
            tiled_ops.add(id(t.op))
            chunk_lists = run_tile(t.op, ctx, self._execute_probe)
            assert len(chunk_lists) == t.op.output_count, (
                f"{type(t.op).__name__} returned {len(chunk_lists)} chunk "
                f"lists for {t.op.output_count} outputs"
            )
            for out, chunks in zip(t.op.outputs, chunk_lists):
                out.chunks = chunks

    def _invalidate(self, dag, stale: list[Tileable]) -> None:
        """Drop cached chunks of stale sources and their descendants so
        the next pass re-tiles them with the wider column set."""
        invalid = {t.key for t in stale}
        for t in dag.topological_order():
            if t.key in invalid or any(i.key in invalid for i in t.inputs):
                invalid.add(t.key)
                t.chunks = None

    def _execute_probe(self, chunks: list[ChunkNode]) -> None:
        """The switch to execution (Fig. 5a step 2): run the partial
        graph, keep payloads + metadata for the resumed generator."""
        self.executor.execute(chunks, pin_targets=True)
        self.probe_keys.update(c.key for c in chunks)

    def release_probes(self, keep: set[str]) -> None:
        """Unpin probe payloads that the final graph no longer needs."""
        self.executor.unpin(self.probe_keys - keep)
        self.probe_keys &= keep
