"""Tests for repro.core.relevance (ground-truth Rel(D, T))."""
import numpy as np
import pytest

from repro.core.data import LakeTable
from repro.core.relevance import match_assignment, rel_score, relevance_matrix


@pytest.fixture()
def rng():
    return np.random.default_rng(0)


class TestRelevanceMatrix:
    def test_shape(self, rng):
        data = [rng.random(50), rng.random(50)]
        t = LakeTable("t", [rng.random(40) for _ in range(3)])
        w = relevance_matrix(data, t)
        assert w.shape == (2, 3)
        assert np.all((w > 0) & (w <= 1))

    def test_exact_column_match_is_one(self, rng):
        c = rng.random(60)
        t = LakeTable("t", [c, rng.random(60) + 5])
        w = relevance_matrix([c], t)
        assert w[0, 0] == pytest.approx(1.0)
        assert w[0, 1] < 1.0


class TestRelScore:
    def test_self_table_perfect(self, rng):
        cols = [rng.random(80) for _ in range(3)]
        t = LakeTable("t", cols)
        assert rel_score([c.copy() for c in cols], t) == pytest.approx(1.0)

    def test_prefers_source_table(self, rng):
        cols = [np.cumsum(rng.standard_normal(100)) for _ in range(2)]
        src = LakeTable("src", cols)
        other = LakeTable("other", [np.cumsum(rng.standard_normal(100)) + 50 for _ in range(2)])
        d = [c.copy() for c in cols]
        assert rel_score(d, src) > rel_score(d, other)

    def test_noisy_duplicate_scores_high(self, rng):
        cols = [10 + np.cumsum(rng.standard_normal(120)) for _ in range(2)]
        src = LakeTable("src", cols)
        dup = src.perturbed(rng, 0.98, 1.02, "dup")
        far = LakeTable("far", [rng.random(120) * 1000 for _ in range(2)])
        d = [c.copy() for c in cols]
        assert rel_score(d, dup) > rel_score(d, far)

    def test_normalised_by_num_series(self, rng):
        # score is a mean over series, so in (0, 1] for rel weights
        data = [rng.random(30) for _ in range(4)]
        t = LakeTable("t", [rng.random(30) for _ in range(2)])
        s = rel_score(data, t)
        assert 0.0 <= s <= 1.0

    def test_empty_data_raises(self):
        with pytest.raises(ValueError):
            rel_score([], LakeTable("t", [np.ones(3)]))


class TestMatchAssignment:
    def test_assignment_is_injective(self, rng):
        data = [rng.random(40) for _ in range(3)]
        t = LakeTable("t", [rng.random(40) for _ in range(5)])
        pairs = match_assignment(data, t)
        assert len(pairs) == 3
        assert len({j for _, j in pairs}) == 3

    def test_recovers_permuted_columns(self, rng):
        cols = [np.cumsum(rng.standard_normal(100)) + o for o in (0, 100, -100)]
        t = LakeTable("t", cols)
        # data series are the columns in reversed order
        data = [cols[2].copy(), cols[1].copy(), cols[0].copy()]
        pairs = match_assignment(data, t)
        assert (0, 2) in pairs and (1, 1) in pairs and (2, 0) in pairs
