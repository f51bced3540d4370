"""Intermediate-result storage service (paper Section V-C)."""
from .service import SimulatedOOM, StorageLevel, StorageService

__all__ = ["StorageService", "StorageLevel", "SimulatedOOM"]
