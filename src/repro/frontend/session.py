"""Session: wires the services (task, meta, storage, scheduling) that
"guarantee transition between tiling and execution" (paper Fig. 5).

``init()`` mirrors ``xorbits.init()``: it creates the default session
that frontends submit to. A session owns one meta service, one storage
service, one executor (local threads or Spark), and one dynamic tiler.
"""
from __future__ import annotations

from typing import Any, Iterable, Optional

import pandas as pd

from repro.core.config import EngineConfig
from repro.core.executor import BaseExecutor, LocalExecutor, SparkExecutor
from repro.core.meta import MetaService
from repro.core.operators.base import Tileable
from repro.core.tiling import GraphTiler
from repro.storage.service import StorageService

_default_session: Optional["XSession"] = None


class XSession:
    """One Xorbits-style session (supervisor + workers at laptop scale)."""

    def __init__(
        self,
        cfg: Optional[EngineConfig] = None,
        spark=None,
        storage_memory_limit: Optional[int] = None,
    ) -> None:
        self.cfg = cfg or EngineConfig()
        self.meta = MetaService()
        self.storage = StorageService(
            memory_limit=storage_memory_limit,
            band_memory_limit=self.cfg.band_memory_limit,
            allow_spill=self.cfg.allow_spill,
        )
        if spark is not None:
            self.executor: BaseExecutor = SparkExecutor(
                spark, self.cfg, self.meta, self.storage
            )
        else:
            self.executor = LocalExecutor(self.cfg, self.meta, self.storage)
        self.tiler = GraphTiler(self.cfg, self.meta, self.executor)

    # -- run -----------------------------------------------------------
    def run(self, *tileables: Tileable) -> list[Any]:
        """Tile (dynamically) + execute + fetch the given tileables.

        This is what deferred evaluation calls under ``__repr__`` /
        ``to_pandas`` — users never trigger it explicitly.
        """
        self.tiler.tile(tileables)
        all_chunks = [c for t in tileables for c in t.chunks]
        self.executor.execute(all_chunks, pin_targets=True)
        keep = {c.key for c in all_chunks}
        self.tiler.release_probes(keep)
        return [self._fetch(t) for t in tileables]

    def _fetch(self, t: Tileable) -> Any:
        raw = self.executor.fetch(t.chunks)
        if t.kind == "scalar":
            return raw[0]
        if t.kind == "tensor":
            import numpy as np

            rows: dict[int, list] = {}
            for chunk, p in zip(t.chunks, raw):
                if p is None:
                    continue
                r, c = chunk.index
                rows.setdefault(r, []).append((c, p))
            stacked = [
                np.concatenate([p for _c, p in sorted(parts, key=lambda x: x[0])], axis=1)
                if len(parts) > 1
                else parts[0][1]
                for _r, parts in sorted(rows.items())
            ]
            return np.concatenate(stacked, axis=0) if len(stacked) > 1 else stacked[0]
        # dataframe/series: concat row chunks in (r) order, skipping empty
        # shuffle buckets (None payloads)
        ordered = sorted(zip(t.chunks, raw), key=lambda cp: cp[0].index)
        payloads = [p for _c, p in ordered if p is not None]
        if not payloads:
            return pd.DataFrame()
        if len(payloads) == 1:
            return payloads[0]
        return pd.concat(payloads)

    def close(self) -> None:
        self.storage.close()

    # -- introspection used by tests/benchmarks --------------------------
    @property
    def stats(self):
        return self.tiler.stats


def init(
    cfg: Optional[EngineConfig] = None, spark=None, **cfg_overrides
) -> XSession:
    """Create and install the default session (``xorbits.init()``)."""
    global _default_session
    if cfg is None:
        cfg = EngineConfig(**cfg_overrides)
    _default_session = XSession(cfg, spark=spark)
    return _default_session


def get_session() -> XSession:
    global _default_session
    if _default_session is None:
        _default_session = XSession()
    return _default_session
