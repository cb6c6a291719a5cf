"""Table II benchmark: one scoring pass per method over the repository."""
import pytest

from repro.bench.harness import FCMMethod, default_methods


@pytest.fixture(scope="module")
def methods(bench, fcm_model):
    return {m.name: m for m in default_methods(bench, fcm=fcm_model)}


def _score_pass(method, bench, query):
    prep = method.prepare_query(query.extracted)
    return [
        method.score(prep, method.encode_table(t))
        for t in list(bench.repository.values())[:10]
    ]


@pytest.mark.parametrize("name", ["CML", "DE-LN", "Opt-LN", "Qetch*", "FCM"])
def test_method_scoring_pass(benchmark, methods, bench, name):
    method = methods[name]
    query = bench.queries[0]
    scores = benchmark.pedantic(
        _score_pass, args=(method, bench, query), rounds=2, iterations=1
    )
    assert len(scores) == 10
