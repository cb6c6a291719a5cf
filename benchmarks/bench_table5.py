"""Table V benchmark: fine-grained (HCMAN) vs global matching cost."""
import pytest

from repro.core.fcm import make_model
from repro.core.matcher import match_fine, match_global


@pytest.fixture(scope="module")
def pair(bench, fcm_model, table_encodings, query_encodings):
    q = bench.queries[0]
    return query_encodings[q.query_id], table_encodings[q.source_table_id]


def test_match_fine(benchmark, pair, fcm_model):
    q, t = pair
    res = benchmark(match_fine, q, t, fcm_model.cfg.attn_tau)
    assert res.features.shape == (7,)


def test_match_global(benchmark, pair):
    q, t = pair
    res = benchmark(match_global, q, t)
    assert res.features.shape == (3,)
