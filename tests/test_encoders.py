"""Tests for the segment-level line chart and dataset encoders."""
import numpy as np
import pytest

from repro.chartsim.extractor import extract
from repro.chartsim.renderer import render_chart
from repro.config import ALL_OPS, FCMConfig
from repro.core.data import LakeTable
from repro.core.dataset_encoder import DatasetEncoder, HMRL
from repro.core.features import Projector, feature_dim, znorm
from repro.core.line_encoder import LineChartEncoder


@pytest.fixture()
def cfg():
    return FCMConfig()


@pytest.fixture()
def rng():
    return np.random.default_rng(0)


class TestLineChartEncoder:
    def test_segment_count(self, cfg, rng):
        enc = LineChartEncoder(cfg)
        eq = extract(render_chart([rng.random(200)]))
        q = enc.encode(eq)
        # chart width 480, P1=60 -> 8 segments per line
        assert q.line_embs[0].shape == (480 // cfg.p1, cfg.k)

    def test_multi_line(self, cfg, rng):
        enc = LineChartEncoder(cfg)
        data = [np.cumsum(rng.standard_normal(150)) + 40 * i for i in range(3)]
        q = enc.encode(extract(render_chart(data)))
        assert q.m == 3
        assert len(q.traces) == 3

    def test_y_range_passthrough(self, cfg):
        enc = LineChartEncoder(cfg)
        eq = extract(render_chart([np.linspace(0, 10, 50)]))
        q = enc.encode(eq)
        assert q.y_range == eq.y_range

    def test_empty_query_raises(self, cfg):
        enc = LineChartEncoder(cfg)
        from repro.chartsim.extractor import ExtractedQuery

        with pytest.raises(ValueError):
            enc.encode(ExtractedQuery(lines=[], y_range=(0, 1), raster=np.zeros((2, 2))))

    def test_p1_controls_granularity(self, rng):
        s = rng.random(200)
        eq = extract(render_chart([s]))
        fine = LineChartEncoder(FCMConfig(p1=30)).encode(eq)
        coarse = LineChartEncoder(FCMConfig(p1=120)).encode(eq)
        assert fine.line_embs[0].shape[0] == 16
        assert coarse.line_embs[0].shape[0] == 4


class TestDatasetEncoder:
    def test_identity_variant_always_first(self, cfg, rng):
        enc = DatasetEncoder(cfg)
        ce = enc.encode_column(rng.random(256), 0)
        assert ce.variants[0].op == "id"
        assert ce.identity.window == 1

    def test_da_variants_cover_all_ops(self, cfg, rng):
        enc = DatasetEncoder(cfg)
        ce = enc.encode_column(rng.random(512), 0)
        ops = {v.op for v in ce.variants}
        assert ops == set(ALL_OPS)

    def test_no_da_config_only_identity(self, rng):
        enc = DatasetEncoder(FCMConfig().without_da())
        ce = enc.encode_column(rng.random(512), 0)
        assert [v.op for v in ce.variants] == ["id"]

    def test_variant_segment_alignment(self, cfg, rng):
        # aggregated variants keep (roughly) the identity's segment count
        enc = DatasetEncoder(cfg)
        ce = enc.encode_column(rng.random(640), 0)
        n_id = ce.identity.emb.shape[0]
        for v in ce.variants:
            if v.window <= 16:
                assert abs(v.emb.shape[0] - n_id) <= 1

    def test_interval_is_min_sum_hull(self, cfg):
        enc = DatasetEncoder(cfg)
        ce = enc.encode_column(np.array([1.0, 2.0, 3.0] * 40), 0)
        lo, hi = ce.interval
        assert lo == 1.0
        assert hi == pytest.approx(240.0)  # sum dominates max

    def test_value_range_plain(self, cfg):
        enc = DatasetEncoder(cfg)
        ce = enc.encode_column(np.array([-5.0, 7.0] * 60), 0)
        assert ce.value_range == (-5.0, 7.0)

    def test_variant_value_ranges_reflect_op(self, cfg, rng):
        enc = DatasetEncoder(cfg)
        col = rng.random(512) + 1.0
        ce = enc.encode_column(col, 0)
        for v in ce.variants:
            if v.op == "sum" and v.window >= 8:
                assert v.value_range[1] > ce.value_range[1]
            if v.op == "min":
                assert v.value_range[0] >= ce.value_range[0] - 1e-9

    def test_table_encoding_shape(self, cfg, rng):
        enc = DatasetEncoder(cfg)
        t = LakeTable("t", [rng.random(200) for _ in range(3)])
        te = enc.encode_table(t)
        assert te.n_cols == 3
        assert te.table_id == "t"
        assert all(c.mean_emb.shape == (cfg.k,) for c in te.columns)

    def test_deterministic(self, cfg, rng):
        col = rng.random(300)
        a = DatasetEncoder(cfg).encode_column(col, 0)
        b = DatasetEncoder(cfg).encode_column(col.copy(), 0)
        np.testing.assert_allclose(a.identity.emb, b.identity.emb)

    def test_short_column_no_crash(self, cfg):
        enc = DatasetEncoder(cfg)
        ce = enc.encode_column(np.array([1.0, 2.0, 3.0]), 0)
        assert ce.identity.emb.shape[0] == 1


class TestHMRL:
    def test_roots_shape(self, cfg, rng):
        p = Projector(feature_dim(cfg.n_profile), cfg.k, seed=0)
        h = HMRL(cfg.k, seed=1)
        z, mu, sigma = znorm(rng.random(256))
        roots = h.roots(z, 64, beta=3, n_profile=cfg.n_profile, projector=p, mu=mu, sigma=sigma)
        assert roots.shape == (4, cfg.k)

    def test_combine_bounded(self, cfg, rng):
        h = HMRL(cfg.k, seed=1)
        l, r = rng.standard_normal((2, 5, cfg.k))
        out = h.combine(l, r)
        assert np.all(np.abs(out) <= 1.0)

    def test_multiscale_differs_from_plain(self, cfg, rng):
        # HMRL blending must change the embedding (it adds information)
        col = rng.random(512)
        e_da = DatasetEncoder(FCMConfig())
        e_plain = DatasetEncoder(FCMConfig().without_da())
        a = e_da.encode_column(col, 0).identity.emb
        b = e_plain.encode_column(col, 0).identity.emb
        assert not np.allclose(a, b)
