"""Tests for repro.core.dtw (banded DTW + resampling)."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core.dtw import dtw_distance, dtw_relevance, resample


class TestResample:
    def test_identity_length(self):
        a = np.array([1.0, 2.0, 3.0])
        out = resample(a, 3)
        np.testing.assert_allclose(out, a)

    def test_identity_returns_copy(self):
        a = np.array([1.0, 2.0, 3.0])
        out = resample(a, 3)
        out[0] = 99.0
        assert a[0] == 1.0

    def test_upsample_endpoints(self):
        a = np.array([0.0, 10.0])
        out = resample(a, 5)
        assert out[0] == 0.0 and out[-1] == 10.0
        np.testing.assert_allclose(out, [0.0, 2.5, 5.0, 7.5, 10.0])

    def test_downsample_preserves_endpoints(self):
        a = np.linspace(0, 1, 100)
        out = resample(a, 10)
        assert out[0] == pytest.approx(0.0)
        assert out[-1] == pytest.approx(1.0)

    def test_single_point_broadcast(self):
        out = resample(np.array([7.0]), 4)
        np.testing.assert_allclose(out, np.full(4, 7.0))

    def test_empty_raises(self):
        with pytest.raises(ValueError):
            resample(np.array([]), 4)

    def test_linear_signal_exact(self):
        a = np.linspace(-3, 5, 17)
        np.testing.assert_allclose(resample(a, 33), np.linspace(-3, 5, 33))


class TestDTWDistance:
    def test_identical_series_zero(self):
        a = np.array([1.0, 2.0, 3.0, 2.0])
        assert dtw_distance(a, a) == pytest.approx(0.0)

    def test_known_small_case(self):
        # DP by hand: a=[0,1], b=[0,1,1] -> warp cost 0
        assert dtw_distance(np.array([0.0, 1.0]), np.array([0.0, 1.0, 1.0])) == 0.0

    def test_constant_offset(self):
        a = np.zeros(5)
        b = np.ones(5)
        assert dtw_distance(a, b) == pytest.approx(5.0)

    def test_symmetry(self):
        rng = np.random.default_rng(0)
        a, b = rng.random(20), rng.random(25)
        assert dtw_distance(a, b) == pytest.approx(dtw_distance(b, a))

    def test_time_shift_cheaper_than_euclidean(self):
        a = np.sin(np.linspace(0, 4 * np.pi, 60))
        b = np.sin(np.linspace(0, 4 * np.pi, 60) + 0.4)
        assert dtw_distance(a, b) < np.abs(a - b).sum()

    def test_band_matches_unbanded_for_wide_band(self):
        rng = np.random.default_rng(1)
        a, b = rng.random(15), rng.random(15)
        assert dtw_distance(a, b, band=15) == pytest.approx(dtw_distance(a, b))

    def test_band_upper_bounds_unbanded(self):
        rng = np.random.default_rng(2)
        a, b = rng.random(30), rng.random(30)
        assert dtw_distance(a, b, band=3) >= dtw_distance(a, b) - 1e-12

    def test_max_len_caps_work(self):
        rng = np.random.default_rng(3)
        a = rng.random(1000)
        b = rng.random(1000)
        d = dtw_distance(a, b, max_len=64)
        assert np.isfinite(d)

    def test_empty_raises(self):
        with pytest.raises(ValueError):
            dtw_distance(np.array([]), np.array([1.0]))

    def test_length_mismatch_band_reachable(self):
        # band smaller than the length gap must still reach the corner
        a = np.ones(10)
        b = np.ones(40)
        assert np.isfinite(dtw_distance(a, b, band=1, max_len=None))

    @settings(max_examples=25, deadline=None)
    @given(
        st.lists(st.floats(-10, 10), min_size=1, max_size=20),
        st.lists(st.floats(-10, 10), min_size=1, max_size=20),
    )
    def test_nonnegative_and_finite(self, xs, ys):
        d = dtw_distance(np.array(xs), np.array(ys))
        assert d >= 0.0 and np.isfinite(d)

    @settings(max_examples=25, deadline=None)
    @given(st.lists(st.floats(-10, 10), min_size=2, max_size=20))
    def test_self_distance_zero(self, xs):
        assert dtw_distance(np.array(xs), np.array(xs)) == pytest.approx(0.0)


class TestDTWRelevance:
    def test_identical_is_one(self):
        a = np.array([1.0, 2.0, 3.0])
        assert dtw_relevance(a, a) == pytest.approx(1.0)

    def test_in_unit_interval(self):
        rng = np.random.default_rng(4)
        r = dtw_relevance(rng.random(30), rng.random(30) * 100)
        assert 0.0 < r <= 1.0

    def test_monotone_in_distance(self):
        a = np.zeros(10)
        near = np.full(10, 0.1)
        far = np.full(10, 5.0)
        assert dtw_relevance(a, near) > dtw_relevance(a, far)
