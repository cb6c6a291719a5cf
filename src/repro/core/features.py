"""Segment featurization and numpy encoders (ViT / transformer analog).

The paper's encoders are trained transformers over line-segment images and
column segments. Our substitution (DESIGN.md §2) keeps the same interface
— a sequence of segment embeddings per line / column — built from:

1. a deterministic segment featurizer (:func:`segment_features`):
   segment-local moments, slope/curvature, extremes, a resampled shape
   profile, a positional channel, and (down-weighted) global-scale
   channels;
2. a seeded random linear projection (:class:`Projector`) — the
   "trainable linear projection layer" of Sec. IV-B, untrained;
3. one numpy self-attention layer (:func:`contextualize`) mixing
   neighbouring segments — the transformer's cross-segment context.

All series are z-normalised *globally per series* before segmentation, so
a segment embedding encodes "where this segment sits and how it moves
within its series", which is what fine-grained cross-modal matching needs.
"""
from __future__ import annotations

import numpy as np

from repro.core.dtw import resample

#: weight of the global-scale channels relative to shape channels
_SCALE_W = 0.25
#: weight of the positional channel
_POS_W = 0.5


def znorm(series: np.ndarray) -> tuple[np.ndarray, float, float]:
    """Global z-normalisation; returns (z, mu, sigma) with sigma floor."""
    s = np.asarray(series, dtype=np.float64).ravel()
    mu = float(s.mean())
    sigma = float(s.std())
    if sigma < 1e-12:
        sigma = 1.0
    return (s - mu) / sigma, mu, sigma


def pooled_profile(row: np.ndarray, n: int) -> np.ndarray:
    """Bucket-mean pooling of a segment down to ``n`` profile points."""
    row = np.asarray(row, dtype=np.float64).ravel()
    if row.size <= n:
        return resample(row, n)
    q = int(np.ceil(row.size / n))
    if row.size != q * n:
        row = resample(row, q * n)
    return row.reshape(n, q).mean(axis=1)


def split_segments(series: np.ndarray, seg_len: int) -> np.ndarray:
    """Split a series into ``N x seg_len`` segments.

    ``N = max(1, round(len/seg_len))``; the series is resampled to
    ``N * seg_len`` first so every segment has the same length (the paper
    assumes divisibility; resampling is the natural generalisation).
    """
    s = np.asarray(series, dtype=np.float64).ravel()
    if seg_len < 1:
        raise ValueError("seg_len must be >= 1")
    n = max(1, int(round(s.size / seg_len)))
    if s.size != n * seg_len:
        s = resample(s, n * seg_len)
    return s.reshape(n, seg_len)


def segment_features(
    segs: np.ndarray, mu: float, sigma: float, n_profile: int
) -> np.ndarray:
    """Featurize every segment of a z-normalised series.

    ``segs`` is (N, L) of z-space values. Output is (N, 9 + n_profile + 2):
    [mean, std, slope, min, max, first, last, curvature, position] +
    shape profile + scaled [log-mu, log-sigma] global channels.
    """
    segs = np.asarray(segs, dtype=np.float64)
    n, _length = segs.shape
    # All moments are computed on the fixed-length pooled profile, NOT the
    # raw segment: the chart side sees a rendering-smoothed trace, so
    # raw-granularity statistics (std/curvature of a noisy 64-point
    # segment) would never match their pixel-space counterparts. The
    # profile uses bucket-MEAN pooling (not point sampling) so
    # high-frequency content is antialiased identically on both sides and
    # elementwise noise averages out instead of decorrelating duplicates.
    prof = np.vstack([pooled_profile(row, n_profile) for row in segs])
    xs = np.arange(n_profile, dtype=np.float64)
    xs -= xs.mean()
    denom = float((xs**2).sum()) or 1.0
    slope = (prof * xs).sum(axis=1) / denom
    if n_profile >= 3:
        curv = np.abs(np.diff(prof, n=2, axis=1)).mean(axis=1)
    else:
        curv = np.zeros(n)
    pos = (np.arange(n) + 0.5) / n * _POS_W
    # oscillation features: mean-crossing rate and total variation of the
    # profile separate periodic series from level-shift series, which the
    # low-order moments alone cannot (both computed at the shared profile
    # granularity so chart and data sides agree).
    centered = prof - prof.mean(axis=1, keepdims=True)
    crossings = (np.diff(np.sign(centered), axis=1) != 0).mean(axis=1)
    tv = np.abs(np.diff(prof, axis=1)).sum(axis=1) / n_profile
    base = np.column_stack(
        [
            prof.mean(axis=1),
            prof.std(axis=1),
            slope * n_profile,  # slope over the whole segment, not per step
            prof.min(axis=1),
            prof.max(axis=1),
            prof[:, 0],
            prof[:, -1],
            curv,
            pos,
            crossings,
            tv,
        ]
    )
    scale = np.tile(
        np.array([np.log1p(abs(mu)), np.log1p(sigma)]) * _SCALE_W, (n, 1)
    )
    return np.hstack([base, prof, scale])


def feature_dim(n_profile: int) -> int:
    return 11 + n_profile + 2


class Projector:
    """Seeded random linear projection base_dim -> K (untrained analog of
    the trainable projection layer; a JL-style rotation preserves cosine
    structure)."""

    def __init__(self, base_dim: int, k: int, seed: int) -> None:
        rng = np.random.default_rng(seed)
        w = rng.standard_normal((base_dim, k)) / np.sqrt(base_dim)
        self.w = w
        self.base_dim = base_dim
        self.k = k

    def __call__(self, feats: np.ndarray) -> np.ndarray:
        feats = np.atleast_2d(np.asarray(feats, dtype=np.float64))
        if feats.shape[1] != self.base_dim:
            raise ValueError(
                f"feature dim {feats.shape[1]} != projector base_dim {self.base_dim}"
            )
        return feats @ self.w


class Attention:
    """One seeded (untrained) self-attention layer with residual mixing."""

    def __init__(self, k: int, seed: int, tau: float = 4.0, mix: float = 0.3) -> None:
        rng = np.random.default_rng(seed)
        self.wq = rng.standard_normal((k, k)) / np.sqrt(k)
        self.wk = rng.standard_normal((k, k)) / np.sqrt(k)
        self.tau = tau
        self.mix = mix

    def __call__(self, e: np.ndarray) -> np.ndarray:
        e = np.atleast_2d(e)
        q, kk = e @ self.wq, e @ self.wk
        logits = q @ kk.T / (self.tau * np.sqrt(e.shape[1]))
        logits -= logits.max(axis=1, keepdims=True)
        a = np.exp(logits)
        a /= a.sum(axis=1, keepdims=True)
        return e + self.mix * (a @ e)


def encode_series(
    series: np.ndarray,
    seg_len: int,
    *,
    n_profile: int,
    projector: Projector,
    attention: Attention | None = None,
) -> np.ndarray:
    """Full encoder for one series: znorm -> segment -> featurize ->
    project -> contextualize. Returns (N, K) segment embeddings."""
    z, mu, sigma = znorm(series)
    segs = split_segments(z, seg_len)
    feats = segment_features(segs, mu, sigma, n_profile)
    emb = projector(feats)
    if attention is not None:
        emb = attention(emb)
    return emb


def cosine_matrix(a: np.ndarray, b: np.ndarray) -> np.ndarray:
    """Pairwise cosine similarity between rows of a (N,K) and b (M,K)."""
    a = np.atleast_2d(a)
    b = np.atleast_2d(b)
    an = a / (np.linalg.norm(a, axis=1, keepdims=True) + 1e-12)
    bn = b / (np.linalg.norm(b, axis=1, keepdims=True) + 1e-12)
    return an @ bn.T
