"""User-facing drop-in APIs: ``xpd`` (pandas-like) and ``xnp``
(NumPy-like), mirroring ``import xorbits.pandas as pd`` (paper § III-B).
"""
from .session import XSession, init, get_session

__all__ = ["XSession", "init", "get_session"]
