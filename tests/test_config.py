"""Tests for repro.config."""
import pytest

from repro.config import (
    AGG_OPS,
    ALL_OPS,
    BenchmarkConfig,
    ChartConfig,
    FCMConfig,
    tiny_benchmark_config,
)


class TestFCMConfig:
    def test_paper_defaults(self):
        cfg = FCMConfig()
        assert cfg.p1 == 60   # line segment width (Sec. VII-B)
        assert cfg.p2 == 64   # column segment size (Sec. VII-B)
        assert cfg.da_enabled

    def test_without_da(self):
        cfg = FCMConfig().without_da()
        assert not cfg.da_enabled
        assert FCMConfig().da_enabled  # original untouched (frozen)

    def test_frozen(self):
        with pytest.raises(Exception):
            FCMConfig().p1 = 10

    def test_da_windows_powers_of_two(self):
        # required by the segment-aligned variant encoding
        for w in FCMConfig().da_windows:
            assert w & (w - 1) == 0


class TestOps:
    def test_agg_ops(self):
        assert AGG_OPS == ("avg", "sum", "max", "min")

    def test_all_ops_includes_identity(self):
        assert ALL_OPS[0] == "id"
        assert set(AGG_OPS) < set(ALL_OPS)


class TestBenchmarkConfig:
    def test_paper_k_default(self):
        assert BenchmarkConfig().k == 50
        assert BenchmarkConfig().n_dupes == 50

    def test_noise_band(self):
        cfg = BenchmarkConfig()
        assert cfg.noise_lo == 0.9 and cfg.noise_hi == 1.1

    def test_tiny_smaller(self):
        tiny, full = tiny_benchmark_config(), BenchmarkConfig()
        assert tiny.n_base_tables < full.n_base_tables
        assert tiny.k < full.k

    def test_chart_config_nested(self):
        assert isinstance(BenchmarkConfig().chart, ChartConfig)
        assert isinstance(BenchmarkConfig().fcm, FCMConfig)
