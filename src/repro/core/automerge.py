"""Auto merge (paper Section IV-C, Fig. 6b).

"Xorbits keeps concatenating data chunks until the merged chunks reach
the predefined size limit." Given chunk-size metadata collected from
execution, :func:`plan_merge_groups` packs adjacent chunks into groups
whose combined (estimated) size stays under ``cfg.chunk_limit``, bounded
by ``max_group`` so any one combine node gathers a few chunks at most —
keeping the graph small without overwhelming a single worker's memory.
"""
from __future__ import annotations

from typing import Optional

from .chunk import ChunkNode


def _est_nbytes(ctx, chunk: ChunkNode) -> Optional[int]:
    m = ctx.meta.get(chunk.key)
    if m is not None and m.nbytes is not None:
        return m.nbytes
    if chunk.meta.nbytes is not None:
        return chunk.meta.nbytes
    return None


def plan_merge_groups(
    ctx, chunks: list[ChunkNode], max_group: int
) -> list[list[ChunkNode]]:
    """Greedily pack adjacent chunks into merge groups.

    Sizes come from the meta service when the chunk has executed
    (dynamic tiling), else from planning hints; unknown sizes fall back
    to the mean of known ones so a fully-unknown level still groups by
    ``max_group`` alone.
    """
    if not chunks:
        return []
    limit = ctx.cfg.chunk_limit
    sizes = [_est_nbytes(ctx, c) for c in chunks]
    known = [s for s in sizes if s is not None]
    fill = (sum(known) / len(known)) if known else None
    groups: list[list[ChunkNode]] = []
    cur: list[ChunkNode] = []
    cur_bytes = 0
    for chunk, size in zip(chunks, sizes):
        size = size if size is not None else fill
        over = (
            len(cur) >= max_group
            or (size is not None and cur and cur_bytes + size > limit)
        )
        if over and cur:
            groups.append(cur)
            cur, cur_bytes = [], 0
        cur.append(chunk)
        if size is not None:
            cur_bytes += size
    if cur:
        groups.append(cur)
    return groups
