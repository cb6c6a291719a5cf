"""FCM — the Fine-grained Cross-modal relevance learning Model.

Assembles extractor -> encoders -> matcher -> head into the three variants
evaluated in the paper:

* ``FCM`` — full model (fine-grained HCMAN matching + DA layers);
* ``FCM-HCMAN`` — ablation with averaged global representations
  (Sec. VII-D.1);
* ``FCM-DA`` — ablation without the DA layers (Sec. VII-D.2).

A model instance is picklable (numpy arrays only) so it can be broadcast
to Spark executors and used inside pandas UDFs.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np

from repro.chartsim.extractor import ExtractedQuery
from repro.config import FCMConfig
from repro.core.data import LakeTable
from repro.core.dataset_encoder import DatasetEncoder, TableEncoding
from repro.core.line_encoder import LineChartEncoder, QueryEncoding
from repro.core.matcher import (
    LogisticHead,
    MatchResult,
    match_fine,
    match_global,
)

VARIANTS = ("full", "no_hcman", "no_da")


@dataclass
class FCMModel:
    """A ready-to-score FCM instance (one of the three variants)."""

    cfg: FCMConfig
    variant: str = "full"
    head: LogisticHead | None = None

    def __post_init__(self) -> None:
        if self.variant not in VARIANTS:
            raise ValueError(f"unknown variant {self.variant!r}; expected {VARIANTS}")
        cfg = self.cfg if self.variant != "no_da" else self.cfg.without_da()
        self.cfg = cfg
        self.line_encoder = LineChartEncoder(cfg)
        self.dataset_encoder = DatasetEncoder(cfg)
        if self.head is None:
            self.head = (
                LogisticHead.default_global()
                if self.variant == "no_hcman"
                else LogisticHead.default_full()
            )

    # -- encoding --------------------------------------------------------
    def encode_query(self, eq: ExtractedQuery) -> QueryEncoding:
        return self.line_encoder.encode(eq, keep_raster=False)

    def encode_table(self, table: LakeTable) -> TableEncoding:
        return self.dataset_encoder.encode_table(table)

    # -- matching --------------------------------------------------------
    def match(self, query: QueryEncoding, table_enc: TableEncoding) -> MatchResult:
        if self.variant == "no_hcman":
            return match_global(query, table_enc)
        return match_fine(query, table_enc, tau=self.cfg.attn_tau)

    def features(self, query: QueryEncoding, table_enc: TableEncoding) -> np.ndarray:
        return self.match(query, table_enc).features

    def score(self, query: QueryEncoding, table_enc: TableEncoding) -> float:
        """Rel'(V, T)."""
        return self.head(self.features(query, table_enc))

    def score_raw(self, eq: ExtractedQuery, table: LakeTable) -> float:
        """Convenience end-to-end path (encodes both sides on the fly)."""
        return self.score(self.encode_query(eq), self.encode_table(table))

    def infer_operator(self, query: QueryEncoding, table_enc: TableEncoding) -> str:
        """Most likely aggregation operator per the MoE gate (majority
        vote over matched lines)."""
        res = self.match(query, table_enc)
        if not res.inferred_ops:
            return "id"
        ops, counts = np.unique(res.inferred_ops, return_counts=True)
        return str(ops[np.argmax(counts)])


def make_model(
    cfg: FCMConfig | None = None,
    variant: str = "full",
    head: LogisticHead | None = None,
) -> FCMModel:
    return FCMModel(cfg=cfg or FCMConfig(), variant=variant, head=head)
