"""Tests for repro.core.data (LakeTable + aggregation operators)."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core.data import LakeTable, aggregate_series


class TestAggregateSeries:
    def test_avg_exact(self):
        a = np.array([1.0, 3.0, 5.0, 7.0])
        np.testing.assert_allclose(aggregate_series(a, "avg", 2), [2.0, 6.0])

    def test_sum_exact(self):
        a = np.array([1.0, 3.0, 5.0, 7.0])
        np.testing.assert_allclose(aggregate_series(a, "sum", 2), [4.0, 12.0])

    def test_max_exact(self):
        a = np.array([1.0, 3.0, 5.0, 7.0])
        np.testing.assert_allclose(aggregate_series(a, "max", 2), [3.0, 7.0])

    def test_min_exact(self):
        a = np.array([1.0, 3.0, 5.0, 7.0])
        np.testing.assert_allclose(aggregate_series(a, "min", 2), [1.0, 5.0])

    def test_partial_tail_window(self):
        a = np.array([1.0, 2.0, 3.0, 4.0, 10.0])
        np.testing.assert_allclose(aggregate_series(a, "sum", 2), [3.0, 7.0, 10.0])

    def test_identity_op(self):
        a = np.array([1.0, 2.0])
        np.testing.assert_allclose(aggregate_series(a, "id", 5), a)

    def test_window_one_is_copy(self):
        a = np.array([1.0, 2.0])
        out = aggregate_series(a, "avg", 1)
        np.testing.assert_allclose(out, a)
        out[0] = 99
        assert a[0] == 1.0

    def test_window_larger_than_series(self):
        a = np.array([1.0, 2.0, 3.0])
        np.testing.assert_allclose(aggregate_series(a, "sum", 100), [6.0])

    def test_unknown_op_raises(self):
        with pytest.raises(ValueError):
            aggregate_series(np.ones(4), "median", 2)

    @settings(max_examples=30, deadline=None)
    @given(
        st.lists(st.floats(-100, 100), min_size=1, max_size=50),
        st.integers(1, 10),
    )
    def test_length_contract(self, xs, w):
        out = aggregate_series(np.array(xs), "avg", w)
        assert out.size == int(np.ceil(len(xs) / w)) if w > 1 else len(xs)

    def test_avg_bounded_by_min_max(self):
        rng = np.random.default_rng(0)
        a = rng.random(100)
        avg = aggregate_series(a, "avg", 7)
        mn = aggregate_series(a, "min", 7)
        mx = aggregate_series(a, "max", 7)
        assert np.all(mn <= avg + 1e-12) and np.all(avg <= mx + 1e-12)


class TestLakeTable:
    def test_basic_properties(self):
        t = LakeTable("t", [np.arange(5), np.ones(5)])
        assert t.n_cols == 2 and t.n_rows == 5
        assert t.names == ["c0", "c1"]

    def test_ragged_raises(self):
        with pytest.raises(ValueError):
            LakeTable("t", [np.arange(5), np.ones(4)])

    def test_empty_raises(self):
        with pytest.raises(ValueError):
            LakeTable("t", [])

    def test_names_mismatch_raises(self):
        with pytest.raises(ValueError):
            LakeTable("t", [np.ones(3)], names=["a", "b"])

    def test_column_intervals_hull(self):
        # min=-5, max=3, sum=-3 -> hull [-5, 3]
        t = LakeTable("t", [np.array([-5.0, 3.0, -1.0])])
        (lo, hi), = t.column_intervals()
        assert lo == -5.0 and hi == 3.0

    def test_column_intervals_sum_dominates(self):
        t = LakeTable("t", [np.array([1.0, 2.0, 3.0])])
        (lo, hi), = t.column_intervals()
        assert lo == 1.0 and hi == 6.0

    def test_perturbed_within_bounds(self):
        rng = np.random.default_rng(0)
        t = LakeTable("t", [np.full(100, 10.0)])
        p = t.perturbed(rng, 0.9, 1.1, "t_d0")
        assert p.table_id == "t_d0"
        assert np.all(p.columns[0] >= 9.0) and np.all(p.columns[0] <= 11.0)
        assert not np.allclose(p.columns[0], t.columns[0])

    def test_perturbed_preserves_shape(self):
        rng = np.random.default_rng(1)
        t = LakeTable("t", [np.arange(10.0), np.ones(10)])
        p = t.perturbed(rng, 0.9, 1.1, "p")
        assert p.n_cols == 2 and p.n_rows == 10
