"""Ground-truth relevance Rel(D, T) (Sec. III-A).

Low level: ``rel(d, C) = 1 / (1 + DTW(d, C))`` on y-values only (x-axis
values are ignored, per the paper). High level: max-weight bipartite
matching between the data series of D and the columns of T; Rel(D, T) is
the mean matched-edge weight (normalising by the number of matched series
keeps Rel comparable across charts with different M).
"""
from __future__ import annotations

import numpy as np

from repro.core.bipartite import hungarian_max, matching_weight
from repro.core.data import LakeTable
from repro.core.dtw import dtw_relevance


def relevance_matrix(
    data: list[np.ndarray],
    table: LakeTable,
    *,
    band: int | None = 16,
    max_len: int | None = 128,
) -> np.ndarray:
    """rel(d_i, C_j) for every data series x column pair."""
    m, nc = len(data), table.n_cols
    w = np.empty((m, nc))
    for i, d in enumerate(data):
        for j, c in enumerate(table.columns):
            w[i, j] = dtw_relevance(d, c, band=band, max_len=max_len)
    return w


def rel_score(
    data: list[np.ndarray],
    table: LakeTable,
    *,
    band: int | None = 16,
    max_len: int | None = 128,
) -> float:
    """Rel(D, T): mean weight of the max-weight bipartite matching."""
    if not data:
        raise ValueError("empty underlying data")
    w = relevance_matrix(data, table, band=band, max_len=max_len)
    pairs = hungarian_max(w)
    if not pairs:
        return 0.0
    return matching_weight(w, pairs) / len(data)


def match_assignment(
    data: list[np.ndarray], table: LakeTable, **kw
) -> list[tuple[int, int]]:
    """The (series, column) assignment behind Rel(D, T) (tests/analysis)."""
    return hungarian_max(relevance_matrix(data, table, **kw))
