"""Table III benchmark: multi-line matching cost scales with M."""
import numpy as np
import pytest

from repro.chartsim.extractor import extract
from repro.chartsim.renderer import render_chart
from repro.core.data import LakeTable


@pytest.mark.parametrize("m", [1, 4, 8])
def test_multiline_match_cost(benchmark, fcm_model, m):
    rng = np.random.default_rng(m)
    cols = [50 * i + np.cumsum(rng.standard_normal(256)) for i in range(max(m, 2))]
    table = LakeTable("t", cols)
    eq = extract(render_chart([cols[i] for i in range(m)]))
    qenc = fcm_model.encode_query(eq)
    tenc = fcm_model.encode_table(table)
    score = benchmark(fcm_model.score, qenc, tenc)
    assert 0.0 < score < 1.0
