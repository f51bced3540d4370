"""Executors: run a chunk graph as fused, scheduled subtasks.

Two implementations with identical semantics:

* :class:`LocalExecutor` — a thread pool; used by unit tests and by the
  baseline engine simulators (fast, no serialisation).
* :class:`SparkExecutor` — each *wave* of ready subtasks becomes one
  Spark job: ``sc.parallelize(payload_items).map(run_subtask)``. This is
  the layer where the paper's subtask ≈ a Spark task (DESIGN.md § 2);
  everything above (tiling, fusion, scheduling) is identical.

Both meter **real bytes** of **real pandas/NumPy payloads** against
per-band budgets; exceeding a budget raises
:class:`repro.storage.SimulatedOOM` (DESIGN.md § 6). Chunk payloads are
reference-counted against the chunk graph and freed once every consumer
has run, so the resident set tracks what a real cluster would hold.
"""
from __future__ import annotations

import os
import threading
from concurrent.futures import ThreadPoolExecutor
from typing import Any, Iterable, Optional

from repro.storage.service import SimulatedOOM, StorageService

from .chunk import ChunkNode, build_chunk_dag, ChunkMeta, payload_nbytes
from .config import EngineConfig
from .fusion import FusedElementwise, execute_fused
from .graph import DAG
from .meta import MetaService
from .scheduler import Scheduler, make_bands
from .subtask import Subtask, build_subtask_graph


class SimulatedHang(RuntimeError):
    """Task-graph size exceeded the scheduler's capacity (the Dask-like
    'hang' failure mode of paper Table II)."""


def run_subtask(
    spec: "SubtaskSpec",
    inputs: dict[str, Any],
    input_sizes: Optional[dict[str, int]] = None,
) -> tuple[dict[str, Any], dict[str, int], int]:
    """Execute one subtask purely: input payloads in, output payloads out.

    Shippable to a Spark task (cloudpickle serialises the chunk ops).
    Intra-subtask intermediates live in the local ``values`` dict and
    are freed as soon as their last intra-subtask consumer ran — both
    for real memory and for the meter.

    Returns ``(outputs, out_sizes, peak_working)``:

    * ``out_sizes`` — bytes of each stored output, measured once;
    * ``peak_working`` — the high-water mark of live bytes inside the
      subtask: live inputs + live intermediates + (for shuffle reducers)
      the *bucket slices* actually gathered. A reducer never
      materialises every mapper's full dict, so whole-dict inputs are
      excluded from the base and only their consumed bucket is charged —
      anything else both mismodels real memory and costs
      O(maps × reducers) in the meter.
    """
    input_sizes = input_sizes or {}
    # intra-subtask consumer counts drive freeing
    consumers: dict[str, int] = {}
    for chunk in spec.chunks:
        for i in chunk.inputs:
            consumers[i.key] = consumers.get(i.key, 0) + 1

    values = dict(inputs)
    sizes: dict[str, int] = {}
    store_keys = set(spec.store_keys)
    bucket_inputs = {
        k for k in spec.input_keys if isinstance(inputs.get(k), dict)
    }
    live: dict[str, int] = {
        k: input_sizes.get(k, 0)
        for k in spec.input_keys
        if k not in bucket_inputs
    }
    live_total = sum(live.values())
    peak = live_total

    for chunk in spec.chunks:
        ins = [values[i.key] for i in chunk.inputs]
        reducer = getattr(chunk.op, "reducer", None)
        bucket_bytes = 0
        if reducer is not None:
            for inp, payload in zip(chunk.inputs, ins):
                if isinstance(payload, dict):
                    blk = payload.get(reducer)
                    if blk is not None:
                        bucket_bytes += payload_nbytes(blk)
        if isinstance(chunk.op, FusedElementwise):
            out = execute_fused(chunk.op, ins)
        else:
            out = chunk.op.execute_chunk(ins, chunk)
        values[chunk.key] = out
        nbytes = payload_nbytes(out)
        sizes[chunk.key] = nbytes
        live[chunk.key] = nbytes
        live_total += nbytes
        peak = max(peak, live_total + bucket_bytes)
        # free inputs whose last consumer just ran
        for i in chunk.inputs:
            consumers[i.key] -= 1
            if consumers[i.key] == 0 and i.key not in store_keys:
                live_total -= live.pop(i.key, 0)
                if i.key not in bucket_inputs and i.key in values:
                    # keep external payloads intact for the driver; only
                    # intra-subtask intermediates are truly dropped
                    if i.key in sizes:
                        del values[i.key]

    outputs = {k: values[k] for k in spec.store_keys}
    out_sizes = {k: sizes[k] for k in spec.store_keys}
    return outputs, out_sizes, peak


class SubtaskSpec:
    """The picklable part of a subtask the workers need."""

    def __init__(self, subtask: Subtask, store_keys: list[str]) -> None:
        self.key = subtask.key
        self.chunks = subtask.chunks
        self.input_keys = subtask.input_keys
        self.store_keys = store_keys
        self.band = subtask.band

    def reducers_needed(self) -> set[int]:
        """Bucket ids this subtask's shuffle-reduce ops will read."""
        out: set[int] = set()
        for c in self.chunks:
            r = getattr(c.op, "reducer", None)
            if r is not None:
                out.add(r)
        return out


class _BucketMarker:
    """Stored in place of a shuffle mapper's bucket dict; the buckets
    themselves live as individual entries (``key::b<r>``) so a reducer
    fetches — and the spill layer moves — only its own bucket, exactly
    the paper's storage-service shuffle. Storing the whole dict instead
    makes every reducer page in every mapper's full output:
    O(maps × reducers) spill churn at scale (measured: 766 s vs ~1 s on
    one TPC-H-lite query)."""

    def __init__(self, buckets: list[int], nbytes: int) -> None:
        self.buckets = buckets
        self.nbytes = nbytes

    @staticmethod
    def bucket_key(key: str, r: int) -> str:
        return f"{key}::b{r}"


class BaseExecutor:
    """Shared orchestration: fuse → schedule → run waves → store/free."""

    def __init__(
        self,
        cfg: EngineConfig,
        meta: MetaService,
        storage: StorageService,
    ) -> None:
        self.cfg = cfg
        self.meta = meta
        self.storage = storage
        self.bands = make_bands(cfg.n_workers, cfg.bands_per_worker)
        self.scheduler = Scheduler(self.bands)
        self.chunk_band: dict[str, str] = {}
        self.tasks_executed = 0
        self.waves = 0
        self._lock = threading.Lock()
        # refcounts persist across execute() calls within one query so
        # probe-phase chunks are freed once the final graph consumed them
        self._pinned: set[str] = set()

    # -- public --------------------------------------------------------
    def execute(self, target_chunks: list[ChunkNode], pin_targets: bool = True) -> None:
        """Execute every not-yet-stored chunk needed by ``target_chunks``
        and record metadata; target payloads stay pinned in storage."""
        dag = build_chunk_dag(target_chunks)
        # walk back from the targets, stopping at stored chunks, so an
        # already-materialised result never recomputes its ancestors
        needed: set[str] = set()
        stack = [c for c in target_chunks if not self.storage.has(c.key)]
        while stack:
            c = stack.pop()
            if c.key in needed:
                continue
            needed.add(c.key)
            stack.extend(
                i for i in c.inputs
                if not self.storage.has(i.key) and i.key not in needed
            )
        pending = [c for c in dag.topological_order() if c.key in needed]
        if not pending:
            return
        if self.cfg.max_tasks is not None and len(pending) > self.cfg.max_tasks:
            raise SimulatedHang(
                f"task graph of {len(pending)} nodes exceeds scheduler "
                f"capacity {self.cfg.max_tasks}"
            )
        sub_dag_full = dag.subgraph(pending)
        sub_dag, subtasks = build_subtask_graph(sub_dag_full, self.cfg)
        assignment = self.scheduler.assign(
            sub_dag,
            self.chunk_band,
            lambda k: self.storage.nbytes_of(k) if self.storage.has(k) else 0,
        )
        for s, band in assignment.items():
            s.band = band.name

        targets = {c.key for c in target_chunks}
        if pin_targets:
            self._pinned |= targets
        external = set()
        for s in subtasks:
            external.update(s.input_keys)
        # consumers per chunk key (for freeing): how many distinct
        # subtasks read each externally-stored chunk
        consumers: dict[str, int] = {}
        for s in subtasks:
            for k in s.input_keys:
                consumers[k] = consumers.get(k, 0) + 1

        done: set[Subtask] = set()
        while len(done) < len(subtasks):
            wave = [
                s
                for s in subtasks
                if s not in done
                and all(p in done for p in sub_dag.predecessors(s))
            ]
            assert wave, "subtask graph stalled (cycle after fusion?)"
            specs = [
                SubtaskSpec(s, s.output_keys(external, self._pinned | targets))
                for s in wave
            ]
            self._run_wave(specs)
            done.update(wave)
            self.waves += 1
            # free chunks whose consumers have all run (lazy engines
            # only; eager Modin-style engines retain everything)
            for s in wave:
                for k in s.input_keys:
                    consumers[k] -= 1
                    if (
                        self.cfg.free_intermediates
                        and consumers[k] == 0
                        and k not in self._pinned
                    ):
                        self._delete_chunk(k)

    def fetch(self, chunks: Iterable[ChunkNode]) -> list[Any]:
        return [self.storage.get(c.key) for c in chunks]

    def _delete_chunk(self, k: str) -> None:
        if not self.storage.has(k):
            return
        payload = self.storage.get(k)
        if isinstance(payload, _BucketMarker):
            for r in payload.buckets:
                self.storage.delete(_BucketMarker.bucket_key(k, r))
        self.storage.delete(k)

    def unpin(self, keys: Iterable[str]) -> None:
        for k in keys:
            self._pinned.discard(k)

    # -- wave execution -------------------------------------------------
    def _gather_inputs(self, spec: SubtaskSpec) -> dict[str, Any]:
        needed = spec.reducers_needed()
        out: dict[str, Any] = {}
        for k in spec.input_keys:
            payload = self.storage.get(k)
            if isinstance(payload, _BucketMarker):
                avail = set(payload.buckets)
                out[k] = {
                    r: self.storage.get(_BucketMarker.bucket_key(k, r))
                    for r in needed & avail
                }
            else:
                out[k] = payload
        return out

    def _store_outputs(
        self, spec: SubtaskSpec, outputs: dict[str, Any], sizes: dict[str, int]
    ) -> None:
        band = spec.band or "w0-n0"
        with self._lock:
            for k, payload in outputs.items():
                if isinstance(payload, dict) and payload and all(
                    isinstance(r, int) for r in payload
                ):
                    # shuffle mapper output: store buckets individually
                    total = 0
                    for r, blk in payload.items():
                        total += self.storage.put(
                            _BucketMarker.bucket_key(k, r), blk, band=band
                        )
                    marker = _BucketMarker(sorted(payload), total)
                    self.storage.put(k, marker, band=band, nbytes=64)
                    self.meta.put(k, ChunkMeta(nbytes=total))
                else:
                    self.storage.put(k, payload, band=band, nbytes=sizes.get(k))
                    self.meta.put(
                        k, ChunkMeta.from_payload(payload, nbytes=sizes.get(k))
                    )
                self.chunk_band[k] = band

    def _input_sizes(self, spec: SubtaskSpec) -> dict[str, int]:
        return {
            k: self.storage.nbytes_of(k)
            for k in spec.input_keys
            if self.storage.has(k)
        }

    def _meter(self, spec: SubtaskSpec, peak_working: int) -> None:
        """Charge the subtask's peak transient working set (inputs +
        live intermediates + gathered buckets) against its band."""
        band = spec.band or "w0-n0"
        with self._lock:
            self.storage.charge_transient(band, peak_working)
            self.storage.release_transient(band, peak_working)

    def _run_wave(self, specs: list[SubtaskSpec]) -> None:  # pragma: no cover
        raise NotImplementedError


class LocalExecutor(BaseExecutor):
    """In-process executor (serial by default, optional thread pool).

    pandas kernels rarely release the GIL, and under sandboxed kernels
    (gVisor) contended futexes are so slow that a thread pool can be
    100× *slower* than serial execution — measured, not hypothetical.
    Bands still drive scheduling and memory metering; wall-clock
    parallelism comes from :class:`SparkExecutor` (real processes) or
    from setting ``REPRO_THREADS=<wave width>`` on native kernels.
    """

    #: waves narrower than this run inline; float('inf') = always serial
    PARALLEL_THRESHOLD = float(os.environ.get("REPRO_THREADS", "inf"))

    def __init__(self, cfg, meta, storage) -> None:
        super().__init__(cfg, meta, storage)
        self._pool: Optional[ThreadPoolExecutor] = None

    def _get_pool(self) -> ThreadPoolExecutor:
        if self._pool is None:
            self._pool = ThreadPoolExecutor(
                max_workers=max(1, len(self.bands)),
                thread_name_prefix="repro-band",
            )
        return self._pool

    def _run_one(self, spec: SubtaskSpec) -> None:
        inputs = self._gather_inputs(spec)
        outputs, sizes, working = run_subtask(spec, inputs, self._input_sizes(spec))
        self._meter(spec, working)
        self._store_outputs(spec, outputs, sizes)
        with self._lock:
            self.tasks_executed += 1

    def _run_wave(self, specs: list[SubtaskSpec]) -> None:
        if len(specs) < self.PARALLEL_THRESHOLD:
            for s in specs:
                self._run_one(s)
            return
        futures = [self._get_pool().submit(self._run_one, s) for s in specs]
        errs = []
        for f in futures:
            try:
                f.result()
            except Exception as e:  # drain all, then raise the first
                errs.append(e)
        if errs:
            raise errs[0]


class SparkExecutor(BaseExecutor):
    """Wave-per-Spark-job executor over ``sc.parallelize`` (RDD layer —
    justification in DESIGN.md § 2)."""

    def __init__(self, spark, cfg, meta, storage) -> None:
        super().__init__(cfg, meta, storage)
        self.spark = spark

    def _run_wave(self, specs: list[SubtaskSpec]) -> None:
        if len(specs) == 1:
            # avoid job overhead for singleton waves (common: final agg)
            spec = specs[0]
            inputs = self._gather_inputs(spec)
            outputs, sizes, working = run_subtask(spec, inputs,
                                                  self._input_sizes(spec))
            self._meter(spec, working)
            self._store_outputs(spec, outputs, sizes)
            self.tasks_executed += 1
            return
        # One partition per subtask: each Spark task deserialises only its
        # own spec + input payloads.
        items = [
            (spec, self._gather_inputs(spec), self._input_sizes(spec))
            for spec in specs
        ]
        sc = self.spark.sparkContext
        results = (
            sc.parallelize(items, len(items))
            .map(lambda it: (it[0].key, run_subtask(it[0], it[1], it[2])))
            .collect()
        )
        by_key = dict(results)
        for spec, _inputs, _sz in items:
            outputs, sizes, working = by_key[spec.key]
            self._meter(spec, working)
            self._store_outputs(spec, outputs, sizes)
            self.tasks_executed += 1
