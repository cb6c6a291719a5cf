"""Core data model: tables, underlying data, and aggregation operators.

* :class:`LakeTable` — an in-memory table (list of numeric columns). The
  Spark lake stores the same thing in long format (``lake/repository.py``);
  this class is the per-partition working representation inside pandas UDFs.
* :func:`aggregate_series` — tumbling-window aggregation (Sec. II: avg,
  sum, max, min over a window size), the operator family behind DA-based
  queries.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np

from repro.config import AGG_OPS

_OP_FUNCS = {
    "avg": np.mean,
    "sum": np.sum,
    "max": np.max,
    "min": np.min,
}


def aggregate_series(a: np.ndarray, op: str, window: int) -> np.ndarray:
    """Tumbling-window aggregation of a 1-D series.

    The series is split into consecutive windows of ``window`` points
    (the final partial window is kept) and each window is reduced with
    ``op``. ``op='id'`` or ``window<=1`` returns a copy.
    """
    a = np.asarray(a, dtype=np.float64).ravel()
    if op == "id" or window <= 1:
        return a.copy()
    if op not in _OP_FUNCS:
        raise ValueError(f"unknown aggregation operator {op!r}; expected {AGG_OPS}")
    if window > a.size:
        window = a.size
    n_full = a.size // window
    f = _OP_FUNCS[op]
    head = a[: n_full * window].reshape(n_full, window)
    if op == "avg":
        out = head.mean(axis=1)
    elif op == "sum":
        out = head.sum(axis=1)
    elif op == "max":
        out = head.max(axis=1)
    else:
        out = head.min(axis=1)
    tail = a[n_full * window :]
    if tail.size:
        out = np.append(out, f(tail))
    return out


@dataclass
class LakeTable:
    """An in-memory numeric table (the unit of discovery).

    ``columns`` holds the numeric columns as float64 arrays; all columns
    share the same length (``n_rows``). ``names`` are informational.
    """

    table_id: str
    columns: list[np.ndarray]
    names: list[str] = field(default_factory=list)

    def __post_init__(self) -> None:
        self.columns = [np.asarray(c, dtype=np.float64).ravel() for c in self.columns]
        if not self.columns:
            raise ValueError(f"table {self.table_id}: at least one column required")
        lens = {c.size for c in self.columns}
        if len(lens) != 1:
            raise ValueError(f"table {self.table_id}: ragged columns {lens}")
        if not self.names:
            self.names = [f"c{i}" for i in range(len(self.columns))]
        if len(self.names) != len(self.columns):
            raise ValueError(f"table {self.table_id}: names/columns mismatch")

    @property
    def n_cols(self) -> int:
        return len(self.columns)

    @property
    def n_rows(self) -> int:
        return int(self.columns[0].size)

    def column_intervals(self) -> list[tuple[float, float]]:
        """Per-column index interval ``[min(C), sum(C)]`` (Sec. VI-A).

        The paper indexes each column by the value range any aggregation
        of it can reach: min under ``min``, sum under ``sum``. When a
        column has negative values its plain sum can undershoot the min,
        so we take the conservative hull of {min, max, sum}.
        """
        out = []
        for c in self.columns:
            lo = float(min(c.min(), c.sum()))
            hi = float(max(c.max(), c.sum()))
            out.append((lo, hi))
        return out

    def perturbed(self, rng: np.random.Generator, lo: float, hi: float, table_id: str) -> "LakeTable":
        """Noise-injected near-duplicate: ``C_new = C * sigma`` with
        ``sigma ~ U(lo, hi)`` elementwise (ground-truth generation,
        Sec. VII-A)."""
        cols = [c * rng.uniform(lo, hi, size=c.size) for c in self.columns]
        return LakeTable(table_id, cols, list(self.names))
