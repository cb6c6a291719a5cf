"""Data augmentations for segmentation-model training (Sec. IV-A).

The paper augments LineChartSeg by transforming the *tabular* data (not
the pixels) and re-rendering, preserving chart semantics. We implement the
three operators — reverse, partitioning, down-sampling — and use them as
the extractor's robustness suite (our extractor is deterministic rather
than trained, so augmentations validate instead of train; DESIGN.md §2).
"""
from __future__ import annotations

import numpy as np

from repro.core.data import LakeTable


def reverse(table: LakeTable, table_id: str | None = None) -> LakeTable:
    """Reverse every column: (a_1..a_n) -> (a_n..a_1)."""
    return LakeTable(
        table_id or f"{table.table_id}__rev",
        [c[::-1].copy() for c in table.columns],
        list(table.names),
    )


def partition(
    table: LakeTable, split: int | None = None, rng: np.random.Generator | None = None
) -> tuple[LakeTable, LakeTable]:
    """Split every column at ``split`` into two tables (random if None)."""
    n = table.n_rows
    if split is None:
        rng = rng or np.random.default_rng(0)
        split = int(rng.integers(max(1, n // 4), max(2, 3 * n // 4)))
    if not (0 < split < n):
        raise ValueError(f"split {split} out of range (0, {n})")
    a = LakeTable(f"{table.table_id}__p0", [c[:split].copy() for c in table.columns], list(table.names))
    b = LakeTable(f"{table.table_id}__p1", [c[split:].copy() for c in table.columns], list(table.names))
    return a, b


def down_sample(table: LakeTable, rho: int, table_id: str | None = None) -> LakeTable:
    """Keep one point per ``rho`` consecutive points in every column."""
    if rho < 1:
        raise ValueError("rho must be >= 1")
    return LakeTable(
        table_id or f"{table.table_id}__ds{rho}",
        [c[::rho].copy() for c in table.columns],
        list(table.names),
    )


def augment_corpus(
    tables: list[LakeTable], rng: np.random.Generator
) -> list[LakeTable]:
    """Apply the three augmentations to a corpus (training-set expansion)."""
    out: list[LakeTable] = []
    for t in tables:
        out.append(reverse(t))
        if t.n_rows >= 8:
            a, b = partition(t, rng=rng)
            out.extend([a, b])
            out.append(down_sample(t, rho=int(rng.integers(2, 5))))
    return out
