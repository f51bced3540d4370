"""Engine interface and outcome classification (paper Tables I/II)."""
from __future__ import annotations

import enum
import time
import traceback
from dataclasses import dataclass
from typing import Any, Callable, Optional

import pandas as pd


class Outcome(enum.Enum):
    OK = "ok"
    OOM = "oom"  # paper: "OOM or Killed"
    HANG = "hang"  # paper: "Hang"
    API = "api"  # paper: "API Compatibility"
    ERROR = "error"  # anything else (counted as failed)

    @property
    def failed(self) -> bool:
        return self is not Outcome.OK


@dataclass
class QueryResult:
    engine: str
    query: str
    outcome: Outcome
    seconds: float
    detail: str = ""
    result: Optional[pd.DataFrame] = None


#: exception types that mean "the API surface doesn't support this"
_API_ERRORS = (NotImplementedError, AttributeError)


def classify_exception(exc: BaseException) -> Outcome:
    from repro.core.executor import SimulatedHang
    from repro.storage.service import SimulatedOOM

    if isinstance(exc, SimulatedOOM) or isinstance(exc, MemoryError):
        return Outcome.OOM
    if isinstance(exc, SimulatedHang):
        return Outcome.HANG
    if isinstance(exc, _API_ERRORS):
        return Outcome.API
    # pandas-on-Spark raises its own "not implemented" family
    if type(exc).__name__ in ("PandasNotImplementedError", "AnalysisException"):
        return Outcome.API
    return Outcome.ERROR


class Engine:
    """Runs a query function over named input tables."""

    name = "base"

    def materialize(self, tables: dict[str, pd.DataFrame]) -> dict[str, Any]:
        """Convert pandas inputs into this engine's frame type."""
        raise NotImplementedError

    def collect(self, result: Any) -> pd.DataFrame:
        """Bring a query result back to pandas."""
        if hasattr(result, "to_pandas"):
            return result.to_pandas()
        return result

    def run_query(
        self, fn: Callable, tables: dict[str, pd.DataFrame], name: str = "?"
    ) -> QueryResult:
        start = time.perf_counter()
        try:
            frames = self.materialize(tables)
            out = fn(frames)
            result = self.collect(out)
            return QueryResult(
                self.name, name, Outcome.OK, time.perf_counter() - start,
                result=result,
            )
        except Exception as exc:  # noqa: BLE001 - classification is the point
            outcome = classify_exception(exc)
            detail = f"{type(exc).__name__}: {exc}"
            if outcome is Outcome.ERROR:
                detail += "\n" + traceback.format_exc(limit=4)
            return QueryResult(
                self.name, name, outcome, time.perf_counter() - start, detail=detail
            )
        finally:
            self.cleanup()

    def cleanup(self) -> None:
        pass
