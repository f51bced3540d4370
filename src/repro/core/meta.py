"""Meta service (paper Fig. 5a, step 2).

During dynamic tiling, executing "the first few chunks" produces
metadata — shape, columns, dtype, nbytes — which the tiler stores here so
that the suspended ``tile`` generators can read it when they resume.
"""
from __future__ import annotations

from typing import Iterable, Optional

from .chunk import ChunkMeta, ChunkNode


class MetaService:
    """Key→metadata store shared by tiler, scheduler, and executor."""

    def __init__(self) -> None:
        self._meta: dict[str, ChunkMeta] = {}

    def put(self, key: str, meta: ChunkMeta) -> None:
        self._meta[key] = meta

    def get(self, key: str) -> Optional[ChunkMeta]:
        return self._meta.get(key)

    def has(self, key: str) -> bool:
        return key in self._meta

    def update_chunk(self, chunk: ChunkNode) -> None:
        """Copy recorded metadata back onto the chunk node, if any."""
        meta = self._meta.get(chunk.key)
        if meta is not None:
            chunk.meta = meta

    def known(self, chunks: Iterable[ChunkNode]) -> bool:
        return all(self.has(c.key) for c in chunks)

    def total_nbytes(self, chunks: Iterable[ChunkNode]) -> Optional[int]:
        """Sum of recorded sizes; None if any chunk lacks metadata."""
        total = 0
        for c in chunks:
            m = self._meta.get(c.key)
            if m is None or m.nbytes is None:
                return None
            total += m.nbytes
        return total

    def clear(self) -> None:
        self._meta.clear()
