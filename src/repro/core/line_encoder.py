"""Segment-level line chart encoder (Sec. IV-B).

Consumes the extractor's value-space line traces (one value per pixel
column) and produces, per line, a sequence of ``N1 = W / P1`` segment
embeddings. The trace is already calibrated into data space via the
y-ticks, so chart-side and dataset-side embeddings live in one space.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np

from repro.chartsim.extractor import ExtractedQuery
from repro.config import FCMConfig
from repro.core.features import (
    Attention,
    Projector,
    encode_series,
    feature_dim,
)


@dataclass
class QueryEncoding:
    """Encoded line chart query: E_V plus the raw extraction artefacts."""

    query_id: str
    line_embs: list[np.ndarray]     # per line: (N1, K)
    traces: list[np.ndarray]        # per line: value-space pixel trace
    y_range: tuple[float, float]
    raster: np.ndarray | None = None
    meta: dict = field(default_factory=dict)

    @property
    def m(self) -> int:
        return len(self.line_embs)


class LineChartEncoder:
    """Shared-parameter encoder for chart lines (ViT analog)."""

    def __init__(self, cfg: FCMConfig) -> None:
        self.cfg = cfg
        base = feature_dim(cfg.n_profile)
        self.projector = Projector(base, cfg.k, seed=cfg.seed)
        self.attention = Attention(cfg.k, seed=cfg.seed + 1)

    def encode_line(self, trace: np.ndarray) -> np.ndarray:
        return encode_series(
            trace,
            self.cfg.p1,
            n_profile=self.cfg.n_profile,
            projector=self.projector,
            attention=self.attention,
        )

    def encode(self, eq: ExtractedQuery, keep_raster: bool = True) -> QueryEncoding:
        if not eq.lines:
            raise ValueError("query has no extracted lines")
        return QueryEncoding(
            query_id=eq.query_id,
            line_embs=[self.encode_line(t) for t in eq.lines],
            traces=[np.asarray(t, dtype=np.float64) for t in eq.lines],
            y_range=eq.y_range,
            raster=eq.raster if keep_raster else None,
            meta=dict(eq.meta or {}),
        )
