"""Operators: each user-facing API is internally one Operator with the
paper's three methods — ``__call__`` (tileable graph), ``tile`` (chunk
graph), ``execute`` (subtask execution on a single-node backend)."""
from .base import Operator, TileContext, Tileable

__all__ = ["Operator", "Tileable", "TileContext"]
