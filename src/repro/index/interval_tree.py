"""Interval tree index (Sec. VI-A).

Each repository column is indexed by the interval ``[min(C), sum(C)]``
hull — the value range any supported aggregation of the column can reach
— and a dataset is a candidate for a query iff at least one of its
columns' intervals overlaps the query's y-tick range. Because the filter
is conservative it admits no false negatives, so effectiveness equals a
linear scan (paper Table VIII).

Two implementations, equivalent by construction and cross-checked in
tests:

* :class:`IntervalTree` — a classic centered interval tree (driver-side
  data structure with O(log n + out) overlap queries);
* :func:`spark_interval_candidates` — the same predicate as a Catalyst
  range filter over the lake's interval DataFrame.
"""
from __future__ import annotations

from dataclasses import dataclass, field
from typing import Any

import numpy as np


@dataclass
class _Node:
    center: float
    by_lo: list[tuple[float, float, Any]]
    by_hi: list[tuple[float, float, Any]]
    left: "_Node | None" = None
    right: "_Node | None" = None


@dataclass
class IntervalTree:
    """Centered interval tree over (lo, hi, payload) intervals."""

    intervals: list[tuple[float, float, Any]]
    root: _Node | None = field(init=False, default=None)

    def __post_init__(self) -> None:
        for lo, hi, _ in self.intervals:
            if hi < lo:
                raise ValueError(f"invalid interval [{lo}, {hi}]")
        self.root = self._build(list(self.intervals))

    def _build(self, items: list[tuple[float, float, Any]]) -> _Node | None:
        if not items:
            return None
        endpoints = sorted({x for lo, hi, _ in items for x in (lo, hi)})
        center = endpoints[len(endpoints) // 2]
        here, left, right = [], [], []
        for iv in items:
            lo, hi, _ = iv
            if hi < center:
                left.append(iv)
            elif lo > center:
                right.append(iv)
            else:
                here.append(iv)
        node = _Node(
            center=center,
            by_lo=sorted(here, key=lambda iv: iv[0]),
            by_hi=sorted(here, key=lambda iv: -iv[1]),
        )
        node.left = self._build(left)
        node.right = self._build(right)
        return node

    def query(self, qlo: float, qhi: float) -> list[Any]:
        """Payloads of all intervals overlapping [qlo, qhi] (closed)."""
        if qhi < qlo:
            raise ValueError("query interval reversed")
        out: list[Any] = []
        self._query(self.root, qlo, qhi, out)
        return out

    def _query(self, node: _Node | None, qlo: float, qhi: float, out: list[Any]) -> None:
        if node is None:
            return
        if qhi < node.center:
            # only intervals whose lo <= qhi can overlap
            for lo, hi, payload in node.by_lo:
                if lo > qhi:
                    break
                out.append(payload)
            self._query(node.left, qlo, qhi, out)
        elif qlo > node.center:
            for lo, hi, payload in node.by_hi:
                if hi < qlo:
                    break
                out.append(payload)
            self._query(node.right, qlo, qhi, out)
        else:
            for _, _, payload in node.by_lo:
                out.append(payload)
            self._query(node.left, qlo, qhi, out)
            self._query(node.right, qlo, qhi, out)


def brute_force_overlaps(
    intervals: list[tuple[float, float, Any]], qlo: float, qhi: float
) -> list[Any]:
    """Reference linear scan (tests)."""
    return [p for lo, hi, p in intervals if lo <= qhi and hi >= qlo]


def pad_query_range(y_range: tuple[float, float], pad: float = 0.25) -> tuple[float, float]:
    """Pad the tick-derived y-range before probing (tick rounding slack)."""
    lo, hi = y_range
    span = max(hi - lo, 1e-12)
    return lo - pad * span, hi + pad * span


def build_table_interval_tree(
    tables: dict[str, "np.ndarray | Any"]
) -> IntervalTree:
    """Index every column interval of every LakeTable; payload=table_id."""
    items: list[tuple[float, float, Any]] = []
    for tid, t in tables.items():
        for lo, hi in t.column_intervals():
            items.append((lo, hi, tid))
    return IntervalTree(items)


def interval_tree_candidates(
    tree: IntervalTree, y_range: tuple[float, float], pad: float = 0.25
) -> set[str]:
    qlo, qhi = pad_query_range(y_range, pad)
    return set(tree.query(qlo, qhi))


def spark_interval_candidates(
    intervals_df, queries: list[tuple[str, tuple[float, float]]], pad: float = 0.25
) -> dict[str, set[str]]:
    """Same filter as a Catalyst range predicate over the lake.

    ``intervals_df`` is lake.repository.interval_df output:
    (table_id, col_id, lo, hi). Returns query_id -> candidate table ids.
    """
    import pandas as pd
    from pyspark.sql import functions as F

    spark = intervals_df.sparkSession
    q_rows = []
    for qid, yr in queries:
        qlo, qhi = pad_query_range(yr, pad)
        q_rows.append({"query_id": qid, "qlo": qlo, "qhi": qhi})
    qdf = spark.createDataFrame(pd.DataFrame(q_rows, columns=["query_id", "qlo", "qhi"]))
    hits = (
        intervals_df.crossJoin(qdf)
        .filter((F.col("lo") <= F.col("qhi")) & (F.col("hi") >= F.col("qlo")))
        .select("query_id", "table_id")
        .distinct()
        .collect()
    )
    out: dict[str, set[str]] = {qid: set() for qid, _ in queries}
    for r in hits:
        out[r["query_id"]].add(r["table_id"])
    return out
