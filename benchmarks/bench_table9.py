"""Table IX benchmark: head-training cost as a function of N^-."""
import pytest

from repro.bench.harness import build_triplets, train_fcm
from repro.core.fcm import make_model


@pytest.fixture(scope="module")
def world(bench):
    model = make_model(bench.cfg.fcm)
    return bench, model


@pytest.mark.parametrize("n_neg", [1, 3, 8])
def test_head_training_vs_n_neg(benchmark, world, n_neg):
    bench, _ = world

    def train():
        model = make_model(bench.cfg.fcm)
        return train_fcm(bench, model, n_neg=n_neg, epochs=20, seed=0)

    result = benchmark.pedantic(train, rounds=1, iterations=1)
    assert len(result.history) == 20


def test_triplet_construction(benchmark, world):
    bench, model = world
    triplets, encs, tables = benchmark.pedantic(
        build_triplets, args=(bench, model), rounds=1, iterations=1
    )
    assert len(triplets) > 0 and set(encs) == set(tables)
