"""Dynamic time warping distance (Sec. III-A low-level relevance).

The paper scores ``rel(d, C) = 1 / (1 + DTW(d, C))``. scipy is not
available, so this is a pure-numpy implementation:

* :func:`dtw_distance` — classic O(n·m) dynamic program, vectorised one
  row at a time, with an optional Sakoe-Chiba band to bound cost.
* :func:`resample` — linear-interpolation resampling used to cap series
  length before DTW (documented substitution: the paper runs exact DTW on
  full-length series; we cap at ``max_len`` for repository-scale sweeps,
  which preserves DTW's ordering on smooth chartable series).
"""
from __future__ import annotations

import numpy as np


def resample(a: np.ndarray, n: int) -> np.ndarray:
    """Linearly resample a 1-D series to exactly ``n`` points."""
    a = np.asarray(a, dtype=np.float64).ravel()
    if a.size == 0:
        raise ValueError("cannot resample an empty series")
    if a.size == n:
        return a.copy()
    if a.size == 1:
        return np.full(n, a[0])
    src = np.linspace(0.0, 1.0, a.size)
    dst = np.linspace(0.0, 1.0, n)
    return np.interp(dst, src, a)


def dtw_distance(
    a: np.ndarray,
    b: np.ndarray,
    *,
    band: int | None = None,
    max_len: int | None = 128,
) -> float:
    """DTW distance with absolute-difference local cost.

    Parameters
    ----------
    a, b : 1-D arrays.
    band : Sakoe-Chiba band half-width (in steps of the longer series);
        ``None`` means unconstrained.
    max_len : if set, both series longer than this are resampled down to
        it first (keeps repository sweeps tractable).
    """
    a = np.asarray(a, dtype=np.float64).ravel()
    b = np.asarray(b, dtype=np.float64).ravel()
    if a.size == 0 or b.size == 0:
        raise ValueError("DTW of an empty series is undefined")
    if max_len is not None:
        if a.size > max_len:
            a = resample(a, max_len)
        if b.size > max_len:
            b = resample(b, max_len)
    n, m = a.size, b.size
    if band is not None:
        # Band must at least cover the length difference to keep the
        # endpoint reachable.
        band = max(band, abs(n - m))
    inf = np.inf
    prev = np.full(m + 1, inf)
    prev[0] = 0.0
    cur = np.empty(m + 1)
    for i in range(1, n + 1):
        cur[:] = inf
        if band is None:
            lo, hi = 1, m
        else:
            c = int(round(i * m / n))
            lo, hi = max(1, c - band), min(m, c + band)
        cost = np.abs(a[i - 1] - b[lo - 1 : hi])
        # cur[j] = cost + min(prev[j], prev[j-1], cur[j-1]); the cur[j-1]
        # term is a left-to-right scan, so keep that loop in Python but
        # precompute the elementwise min of the two prev terms.
        base = np.minimum(prev[lo : hi + 1], prev[lo - 1 : hi])
        run = inf
        for idx in range(hi - lo + 1):
            run = cost[idx] + min(base[idx], run)
            cur[lo + idx] = run
        prev, cur = cur, prev
    d = prev[m]
    return float(d)


def dtw_relevance(a: np.ndarray, b: np.ndarray, **kw) -> float:
    """``rel(d, C) = 1 / (1 + DTW(d, C))`` (Sec. III-A)."""
    return 1.0 / (1.0 + dtw_distance(a, b, **kw))
