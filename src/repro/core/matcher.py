"""Cross-modal matcher — HCMAN analog (Sec. IV-D) plus the MoE gate.

Two matching levels, as in the paper:

* **Segment level (SL-SAN)**: scaled-dot-product attention between line
  segment embeddings and column segment embeddings; a line-column score is
  an attention-pooled similarity, so fine-grained (partial/offset) matches
  are rewarded.
* **Line-to-column level (LL-SAN)**: the line x column score matrix is
  resolved with max-weight bipartite matching — the discrete analog of the
  paper's relevance-weighted reconstruction — and the matched edges are
  summarised into a fixed-size statistics vector.

The statistics vector is squashed to ``Rel'(V,T)`` by a logistic head
(:class:`LogisticHead`), which is the *trained* component (Sec. V-E).
The MoE gate (Sec. V-D) softmax-weighs the per-operator experts of each
column by their match quality; its argmax is the inferred operator.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np

from repro.config import ALL_OPS
from repro.core.bipartite import hungarian_max
from repro.core.dataset_encoder import ColumnEncoding, TableEncoding
from repro.core.features import cosine_matrix
from repro.core.line_encoder import QueryEncoding

#: feature names of the full (fine-grained) matcher
FEATURES_FULL = (
    "mean_matched",
    "min_matched",
    "max_matched",
    "mean_fwd",
    "coverage",
    "range_overlap",
    "gate_conf",
)
#: feature names of the global (FCM-HCMAN ablation) matcher
FEATURES_GLOBAL = ("global_cos", "range_overlap", "coverage")

_GATE_TAU = 12.0
#: weight of the range-consistency (IoU) bonus inside the matching score
_RANGE_W = 0.6
#: identity-expert prior added before the MoE gate softmax
_ID_PRIOR = 0.02


def segment_scores(ev: np.ndarray, et: np.ndarray, tau: float) -> tuple[float, float]:
    """Segment-level match of one line vs one column variant.

    Returns ``(score, fwd)`` where score blends max-pooled and
    attention-pooled similarities in both directions and ``fwd`` is the
    forward attention-pooled similarity (kept as a separate statistic).
    """
    s = cosine_matrix(ev, et)
    row_max = s.max(axis=1)
    col_max = s.max(axis=0)
    logits = s * tau
    logits -= logits.max(axis=1, keepdims=True)
    a = np.exp(logits)
    a /= a.sum(axis=1, keepdims=True)
    fwd = float((a * s).sum(axis=1).mean())
    score = 0.5 * float(row_max.mean()) + 0.3 * fwd + 0.2 * float(col_max.mean())
    return score, fwd


def moe_column_score(
    ev: np.ndarray,
    col: ColumnEncoding,
    tau: float,
    line_range: tuple[float, float] | None = None,
) -> tuple[float, float, str, float, float]:
    """Line-vs-column score through the MoE gate over operator experts.

    Per expert op, the score is the best over its window variants, with a
    range-consistency bonus (the transformed series should live where the
    line lives — the value-space evidence the y-ticks provide). The gate
    is a softmax over expert scores. Returns
    ``(score, fwd, inferred_op, gate_confidence, range_iou)``.
    """
    per_op: dict[str, tuple[float, float, float]] = {}
    for var in col.variants:
        sc, fwd = segment_scores(ev, var.emb, tau)
        iou = range_iou(line_range, var.value_range) if line_range else 0.0
        total = sc + _RANGE_W * iou
        cur = per_op.get(var.op)
        if cur is None or total > cur[0]:
            per_op[var.op] = (total, fwd, iou)
    ops = [op for op in ALL_OPS if op in per_op]
    scores = np.array([per_op[op][0] for op in ops])
    # small identity prior: on smooth data a tiny-window aggregate is
    # numerically identical to the raw column, so near-ties must resolve
    # to "no aggregation" (the learned gate of the paper encodes the same
    # prior through the non-DA transformation layer).
    scores = scores + np.array([_ID_PRIOR if op == "id" else 0.0 for op in ops])
    logits = scores * _GATE_TAU
    logits -= logits.max()
    g = np.exp(logits)
    g /= g.sum()
    score = float((g * scores).sum())
    fwd = float((g * np.array([per_op[op][1] for op in ops])).sum())
    best = int(np.argmax(g))
    return score, fwd, ops[best], float(g[best]), per_op[ops[best]][2]


def range_iou(a: tuple[float, float], b: tuple[float, float]) -> float:
    """Intersection-over-union of two value ranges."""
    inter = min(a[1], b[1]) - max(a[0], b[0])
    union = max(a[1], b[1]) - min(a[0], b[0])
    if union <= 1e-12:
        return 1.0  # both ranges degenerate and coincident
    return float(np.clip(inter / union, 0.0, 1.0))


def range_overlap(q_range: tuple[float, float], c_range: tuple[float, float]) -> float:
    """Fraction of the query y-range covered by the column range."""
    qlo, qhi = q_range
    clo, chi = c_range
    width = max(qhi - qlo, 1e-12)
    inter = min(qhi, chi) - max(qlo, clo)
    return float(np.clip(inter / width, 0.0, 1.0))


def filter_columns(
    query: QueryEncoding, table: TableEncoding, pad: float = 0.25
) -> list[ColumnEncoding]:
    """Tick-based column filter (Sec. IV-C): keep columns whose
    ``[min, sum]`` hull overlaps the padded query y-range; fall back to
    all columns if the filter empties the table."""
    qlo, qhi = query.y_range
    span = max(qhi - qlo, 1e-12)
    lo, hi = qlo - pad * span, qhi + pad * span
    kept = [c for c in table.columns if c.interval[0] <= hi and c.interval[1] >= lo]
    return kept or list(table.columns)


@dataclass
class MatchResult:
    features: np.ndarray
    pairs: list[tuple[int, int]]          # (line idx, kept-column idx)
    inferred_ops: list[str]               # per matched line
    kept_col_ids: list[int]


def match_fine(query: QueryEncoding, table: TableEncoding, tau: float) -> MatchResult:
    """Full fine-grained HCMAN matching -> FEATURES_FULL vector."""
    cols = filter_columns(query, table)
    m, nc = query.m, len(cols)
    line_ranges = [
        (float(np.min(t)), float(np.max(t))) for t in query.traces
    ]
    score = np.empty((m, nc))
    fwd = np.empty((m, nc))
    op_inf = np.empty((m, nc), dtype=object)
    conf = np.empty((m, nc))
    iou = np.empty((m, nc))
    for i, ev in enumerate(query.line_embs):
        for j, col in enumerate(cols):
            (
                score[i, j],
                fwd[i, j],
                op_inf[i, j],
                conf[i, j],
                iou[i, j],
            ) = moe_column_score(ev, col, tau, line_range=line_ranges[i])
    pairs = hungarian_max(score)
    matched = np.array([score[i, j] for i, j in pairs])
    # Normalise by M (the number of lines), like Rel(D, T) in Sec. III-A:
    # a table that cannot cover every line pays for each unmatched line.
    coverage = len(pairs) / m
    feats = np.array(
        [
            matched.sum() / m,
            matched.min() if len(pairs) == m else 0.0,
            matched.max(),
            float(np.sum([fwd[i, j] for i, j in pairs])) / m,
            coverage,
            float(np.sum([iou[i, j] for i, j in pairs])) / m,
            float(np.mean([conf[i, j] for i, j in pairs])),
        ]
    )
    return MatchResult(
        features=feats,
        pairs=pairs,
        inferred_ops=[op_inf[i, j] for i, j in pairs],
        kept_col_ids=[c.col_id for c in cols],
    )


def match_global(query: QueryEncoding, table: TableEncoding) -> MatchResult:
    """FCM-HCMAN ablation (Sec. VII-D.1): averaged representations and a
    single global cosine — no segment-level or line-level matching."""
    v = np.mean([e.mean(axis=0) for e in query.line_embs], axis=0)
    cols = table.columns
    t = np.mean([c.mean_emb for c in cols], axis=0)
    cos = float(cosine_matrix(v[None, :], t[None, :])[0, 0])
    # one global range check: union of line ranges vs union of column ranges
    qlo = min(float(np.min(tr)) for tr in query.traces)
    qhi = max(float(np.max(tr)) for tr in query.traces)
    clo = min(c.value_range[0] for c in cols)
    chi = max(c.value_range[1] for c in cols)
    ro = range_iou((qlo, qhi), (clo, chi))
    cov = min(len(cols), query.m) / query.m
    return MatchResult(
        features=np.array([cos, ro, cov]),
        pairs=[],
        inferred_ops=[],
        kept_col_ids=[c.col_id for c in cols],
    )


@dataclass
class LogisticHead:
    """The trained scoring head: Rel' = sigmoid(w . std(f) + b).

    ``x_mean``/``x_scale`` standardize the feature vector before the
    linear map (baked in at training time so the head is self-contained;
    identity for the hand-set default heads).
    """

    w: np.ndarray
    b: float
    x_mean: np.ndarray | None = None
    x_scale: np.ndarray | None = None

    def __call__(self, feats: np.ndarray) -> float:
        f = np.asarray(feats, dtype=np.float64)
        if self.x_mean is not None:
            f = (f - self.x_mean) / self.x_scale
        z = float(np.dot(self.w, f) + self.b)
        return float(1.0 / (1.0 + np.exp(-np.clip(z, -30, 30))))

    @staticmethod
    def default_full() -> "LogisticHead":
        """Sane hand-set weights so FCM ranks before any training; jobs
        replace this with a trained head (core/train.py)."""
        w = np.array([4.0, 1.5, 0.5, 1.0, 1.0, 1.0, 0.5])
        return LogisticHead(w=w, b=-4.0)

    @staticmethod
    def default_global() -> "LogisticHead":
        return LogisticHead(w=np.array([4.0, 1.0, 1.0]), b=-3.0)
