"""Segment-level dataset encoder with the three DA layers (Sec. IV-C, V).

Per column the encoder emits one :class:`ColumnEncoding` holding:

* the **identity expert**: segment embeddings of the raw column
  (``P2``-point segments), optionally enriched by the HMRL multi-scale
  layer (Sec. V-C) — a binary tree over ``2**beta`` sub-segments whose
  bottom-up pooling injects information from window sizes
  ``P2/2**beta .. P2`` into each segment embedding;
* four **aggregation experts** (Sec. V-B transformation layers): the
  column transformed by each operator at a family of tumbling windows
  (our exact-simulation substitution for the learned per-operator MLP —
  DESIGN.md §2), each transformed series encoded like a raw column.

The MoE gate (Sec. V-D) lives in the matcher: it weighs experts by match
quality at query time, which is how "infer the most likely aggregation
operator" is realised here.

Also emits the per-column artefacts the indexes need: the interval
``[min, sum]`` hull (interval tree, Sec. VI-A) and the mean segment
embedding (LSH, Sec. VI-A).
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np

from repro.config import AGG_OPS, FCMConfig
from repro.core.data import LakeTable, aggregate_series
from repro.core.features import (
    Attention,
    Projector,
    encode_series,
    feature_dim,
    segment_features,
    split_segments,
    znorm,
)


@dataclass
class ColumnVariant:
    """One expert's view of a column: (op, window) -> segment embeddings."""

    op: str
    window: int
    emb: np.ndarray  # (N2_variant, K)
    value_range: tuple[float, float] = (0.0, 0.0)  # range of the transformed series


@dataclass
class ColumnEncoding:
    col_id: int
    interval: tuple[float, float]        # [min, sum] hull (index key)
    value_range: tuple[float, float]     # plain [min, max]
    variants: list[ColumnVariant]
    mean_emb: np.ndarray                 # column-level embedding (LSH / CML)

    @property
    def identity(self) -> ColumnVariant:
        return self.variants[0]


@dataclass
class TableEncoding:
    table_id: str
    columns: list[ColumnEncoding]
    n_rows: int = 0
    meta: dict = field(default_factory=dict)

    @property
    def n_cols(self) -> int:
        return len(self.columns)


class HMRL:
    """Hierarchical multi-scale representation layer (Sec. V-C).

    Splits each segment into ``2**beta`` sub-segment leaves, featurizes and
    projects each leaf, then pools pairs bottom-up with a seeded nonlinear
    combine (the MLP ``f`` of the paper, untrained). The root carries
    information from every scale; it is blended into the plain segment
    embedding.
    """

    def __init__(self, k: int, seed: int) -> None:
        rng = np.random.default_rng(seed)
        self.wc = rng.standard_normal((k, k)) / np.sqrt(k)

    def combine(self, left: np.ndarray, right: np.ndarray) -> np.ndarray:
        return np.tanh((left + right) @ self.wc)

    def roots(
        self,
        z: np.ndarray,
        seg_len: int,
        beta: int,
        n_profile: int,
        projector: Projector,
        mu: float,
        sigma: float,
    ) -> np.ndarray:
        """Per-segment multi-scale root embeddings, shape (N, K)."""
        n_leaves = 2**beta
        sub_len = max(1, seg_len // n_leaves)
        segs = split_segments(z, seg_len)
        n = segs.shape[0]
        leaves = split_segments(segs.reshape(-1), sub_len)
        feats = segment_features(leaves, mu, sigma, n_profile)
        emb = projector(feats)
        per_seg = emb.shape[0] // n
        level = emb.reshape(n, per_seg, -1)
        while level.shape[1] > 1:
            if level.shape[1] % 2 == 1:  # odd count: carry the last node up
                carry = level[:, -1:, :]
                level = np.concatenate(
                    [self.combine(level[:, :-1:2, :], level[:, 1:-1:2, :]), carry],
                    axis=1,
                )
            else:
                level = self.combine(level[:, ::2, :], level[:, 1::2, :])
        return level[:, 0, :]


class DatasetEncoder:
    """Segment-level dataset encoder (shared parameters with nothing —
    the chart and dataset encoders are separate models, as in the paper)."""

    def __init__(self, cfg: FCMConfig) -> None:
        self.cfg = cfg
        base = feature_dim(cfg.n_profile)
        # The projection/attention parameters are SHARED with the line
        # chart encoder (same seeds): the paper aligns the two embedding
        # spaces by joint training; with untrained parameters the spaces
        # only align if they are the same map (DESIGN.md §2).
        self.projector = Projector(base, cfg.k, seed=cfg.seed)
        self.attention = Attention(cfg.k, seed=cfg.seed + 1)
        self.hmrl = HMRL(cfg.k, seed=cfg.seed + 4)
        #: blend weight of the HMRL root into the segment embedding
        self.hmrl_mix = 0.2

    # -- per-series encoding ------------------------------------------------
    def _encode_raw(
        self, series: np.ndarray, seg_len: int, with_hmrl: bool
    ) -> np.ndarray:
        emb = encode_series(
            series,
            seg_len,
            n_profile=self.cfg.n_profile,
            projector=self.projector,
            attention=self.attention,
        )
        if with_hmrl and seg_len >= 2 ** self.cfg.beta and series.size >= seg_len:
            z, mu, sigma = znorm(series)
            roots = self.hmrl.roots(
                z, seg_len, self.cfg.beta, self.cfg.n_profile,
                self.projector, mu, sigma,
            )
            emb = (1 - self.hmrl_mix) * emb + self.hmrl_mix * roots
        return emb

    # -- column / table encoding ---------------------------------------------
    def encode_column(self, col: np.ndarray, col_id: int) -> ColumnEncoding:
        col = np.asarray(col, dtype=np.float64).ravel()
        cfg = self.cfg
        variants = [
            ColumnVariant(
                "id",
                1,
                self._encode_raw(col, cfg.p2, with_hmrl=cfg.da_enabled),
                value_range=(float(col.min()), float(col.max())),
            )
        ]
        if cfg.da_enabled:
            for op in AGG_OPS:
                for w in cfg.da_windows:
                    if w >= col.size or col.size // w < 4:
                        continue
                    agg = aggregate_series(col, op, w)
                    # Aggregation by a window of w shrinks the series by w,
                    # so the segment length shrinks with it: the variant
                    # keeps the SAME segment count (and the same fraction
                    # of the series per segment) as the identity encoding.
                    # This is the paper's within-segment transformation
                    # layer: window >= P2 degenerates to 2-point segments,
                    # which is exactly the Table IV collapse past P2.
                    seg_len_v = max(2, cfg.p2 // w)
                    variants.append(
                        ColumnVariant(
                            op,
                            w,
                            self._encode_raw(agg, seg_len_v, with_hmrl=False),
                            value_range=(float(agg.min()), float(agg.max())),
                        )
                    )
        lo = float(min(col.min(), col.sum()))
        hi = float(max(col.max(), col.sum()))
        mean_emb = variants[0].emb.mean(axis=0)
        return ColumnEncoding(
            col_id=col_id,
            interval=(lo, hi),
            value_range=(float(col.min()), float(col.max())),
            variants=variants,
            mean_emb=mean_emb,
        )

    def encode_table(self, table: LakeTable) -> TableEncoding:
        return TableEncoding(
            table_id=table.table_id,
            columns=[self.encode_column(c, i) for i, c in enumerate(table.columns)],
            n_rows=table.n_rows,
        )
