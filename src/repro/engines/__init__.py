"""Engines: the Xorbits reproduction plus baseline framework simulators.

Every engine runs the *same* pandas-style query functions over the
*same* chunked substrate with the *same* honest memory meter; they
differ only in partitioning/reduce policy and API surface — the paper's
claimed differentiators (DESIGN.md § 3). The PySpark baseline is the
real ``pyspark.pandas``.
"""
from .base import Outcome, QueryResult
from .engines import (
    DaskSimEngine,
    ModinSimEngine,
    PandasSimEngine,
    SparkPandasEngine,
    SparkPolicySimEngine,
    XorbitsEngine,
)

__all__ = [
    "Outcome",
    "QueryResult",
    "XorbitsEngine",
    "PandasSimEngine",
    "ModinSimEngine",
    "DaskSimEngine",
    "SparkPolicySimEngine",
    "SparkPandasEngine",
]
