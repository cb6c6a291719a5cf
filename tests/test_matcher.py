"""Tests for repro.core.matcher (HCMAN analog + MoE gate)."""
import numpy as np
import pytest

from repro.chartsim.extractor import extract
from repro.chartsim.renderer import render_chart
from repro.config import FCMConfig
from repro.core.data import LakeTable
from repro.core.dataset_encoder import DatasetEncoder
from repro.core.line_encoder import LineChartEncoder
from repro.core.matcher import (
    FEATURES_FULL,
    FEATURES_GLOBAL,
    LogisticHead,
    filter_columns,
    match_fine,
    match_global,
    moe_column_score,
    range_iou,
    range_overlap,
    segment_scores,
)


@pytest.fixture()
def cfg():
    return FCMConfig()


@pytest.fixture()
def encoders(cfg):
    return LineChartEncoder(cfg), DatasetEncoder(cfg)


def _query(encoders, data):
    line_enc, _ = encoders
    return line_enc.encode(extract(render_chart(data)))


class TestSegmentScores:
    def test_self_match_high(self, rng=np.random.default_rng(0)):
        e = rng.standard_normal((8, 16))
        score, fwd = segment_scores(e, e, tau=8.0)
        assert score > 0.9
        assert fwd > 0.5

    def test_orthogonal_low(self):
        a = np.eye(8, 16)
        b = -np.eye(8, 16)
        score, _ = segment_scores(a, b, tau=8.0)
        assert score < 0.0


class TestRangeFunctions:
    def test_iou_identical(self):
        assert range_iou((0, 10), (0, 10)) == pytest.approx(1.0)

    def test_iou_disjoint(self):
        assert range_iou((0, 1), (5, 6)) == 0.0

    def test_iou_partial(self):
        assert range_iou((0, 10), (5, 15)) == pytest.approx(1 / 3)

    def test_iou_degenerate(self):
        assert range_iou((3, 3), (3, 3)) == 1.0

    def test_overlap_fraction(self):
        assert range_overlap((0, 10), (5, 20)) == pytest.approx(0.5)
        assert range_overlap((0, 10), (-5, 20)) == 1.0


class TestFilterColumns:
    def test_keeps_overlapping(self, cfg, encoders):
        _, denc = encoders
        t = LakeTable("t", [np.linspace(0, 10, 100), np.linspace(1e6, 2e6, 100)])
        te = denc.encode_table(t)
        q = _query(encoders, [np.linspace(2, 8, 50)])
        kept = filter_columns(q, te)
        ids = [c.col_id for c in kept]
        assert 0 in ids

    def test_fallback_when_all_filtered(self, cfg, encoders):
        _, denc = encoders
        t = LakeTable("t", [np.linspace(1e6, 2e6, 100)])
        te = denc.encode_table(t)
        q = _query(encoders, [np.linspace(2, 8, 50)])
        assert len(filter_columns(q, te)) == 1  # falls back to all


class TestMatchFine:
    def test_feature_vector_shape(self, encoders):
        _, denc = encoders
        rng = np.random.default_rng(0)
        t = LakeTable("t", [rng.random(200) for _ in range(3)])
        q = _query(encoders, [rng.random(100)])
        res = match_fine(q, denc.encode_table(t), tau=8.0)
        assert res.features.shape == (len(FEATURES_FULL),)

    def test_self_table_beats_other(self, encoders):
        _, denc = encoders
        rng = np.random.default_rng(1)
        cols = [np.cumsum(rng.standard_normal(200)) + 50]
        src = LakeTable("src", cols)
        other = LakeTable("other", [np.cumsum(rng.standard_normal(200)) - 50])
        q = _query(encoders, [cols[0]])
        f_src = match_fine(q, denc.encode_table(src), tau=8.0).features
        f_other = match_fine(q, denc.encode_table(other), tau=8.0).features
        assert f_src[0] > f_other[0]

    def test_unmatched_lines_penalised(self, encoders):
        _, denc = encoders
        rng = np.random.default_rng(2)
        cols = [np.cumsum(rng.standard_normal(150)) + 30 * i for i in range(3)]
        src = LakeTable("src", cols)
        # table with a single column cannot cover a 3-line query
        small = LakeTable("small", [cols[0].copy()])
        q = _query(encoders, cols)
        f_full = match_fine(q, denc.encode_table(src), tau=8.0).features
        f_small = match_fine(q, denc.encode_table(small), tau=8.0).features
        assert f_full[4] == 1.0          # coverage
        assert f_small[4] < 1.0
        assert f_small[1] == 0.0         # min_matched zeroed when uncovered
        assert f_full[0] > f_small[0]    # sum/m penalises missing lines

    def test_assignment_injective(self, encoders):
        _, denc = encoders
        rng = np.random.default_rng(3)
        t = LakeTable("t", [rng.random(100) for _ in range(4)])
        q = _query(encoders, [rng.random(80) for _ in range(2)])
        res = match_fine(q, denc.encode_table(t), tau=8.0)
        cols = [j for _, j in res.pairs]
        assert len(set(cols)) == len(cols)

    def test_inferred_ops_valid(self, encoders):
        _, denc = encoders
        rng = np.random.default_rng(4)
        t = LakeTable("t", [rng.random(300)])
        q = _query(encoders, [rng.random(100)])
        res = match_fine(q, denc.encode_table(t), tau=8.0)
        assert all(op in ("id", "avg", "sum", "max", "min") for op in res.inferred_ops)


class TestMatchGlobal:
    def test_feature_vector_shape(self, encoders):
        _, denc = encoders
        rng = np.random.default_rng(0)
        t = LakeTable("t", [rng.random(100)])
        q = _query(encoders, [rng.random(80)])
        res = match_global(q, denc.encode_table(t))
        assert res.features.shape == (len(FEATURES_GLOBAL),)
        assert res.pairs == []


class TestLogisticHead:
    def test_monotone_in_features(self):
        head = LogisticHead(w=np.array([2.0, 0.0]), b=-1.0)
        assert head(np.array([1.0, 0.0])) > head(np.array([0.0, 0.0]))

    def test_output_in_unit_interval(self):
        head = LogisticHead.default_full()
        f = np.random.default_rng(0).random(len(FEATURES_FULL))
        assert 0.0 < head(f) < 1.0

    def test_default_shapes_match_features(self):
        assert LogisticHead.default_full().w.shape == (len(FEATURES_FULL),)
        assert LogisticHead.default_global().w.shape == (len(FEATURES_GLOBAL),)


class TestMoEGate:
    def test_gate_confidence_bounds(self, encoders):
        _, denc = encoders
        rng = np.random.default_rng(5)
        ce = denc.encode_column(rng.random(400), 0)
        q = _query(encoders, [rng.random(100)])
        score, fwd, op, conf, iou = moe_column_score(
            q.line_embs[0], ce, tau=8.0, line_range=(0.0, 1.0)
        )
        assert op in ("id", "avg", "sum", "max", "min")
        assert 0.0 < conf <= 1.0
        assert 0.0 <= iou <= 1.0

    def test_infers_aggregation_on_spiky_data(self, encoders):
        """A max-aggregated chart over spiky data must not gate to 'id'."""
        line_enc, denc = encoders
        rng = np.random.default_rng(6)
        col = np.cumsum(rng.standard_normal(400))
        spikes = rng.random(400) < 0.1
        col[spikes] += rng.standard_normal(int(spikes.sum())) * 20
        from repro.core.data import aggregate_series

        agg = aggregate_series(col, "max", 8)
        q = line_enc.encode(extract(render_chart([agg])))
        ce = denc.encode_column(col, 0)
        _, _, op, _, _ = moe_column_score(
            q.line_embs[0], ce, tau=8.0,
            line_range=(float(agg.min()), float(agg.max())),
        )
        assert op != "id"
