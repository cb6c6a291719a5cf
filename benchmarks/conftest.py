"""Shared fixtures for the per-table benchmarks.

One tiny-scale benchmark world is built per session; each bench_tableN
file then measures its table's core computation (corpus build, method
scoring pass, index probing, head training, ...). Absolute numbers are
machine-dependent; EXPERIMENTS.md records the bench-scale job results.
"""
import pytest

from repro.bench.benchmark import build_benchmark
from repro.config import tiny_benchmark_config


@pytest.fixture(scope="session")
def bench(spark):
    return build_benchmark(tiny_benchmark_config(seed=13), spark=spark)


@pytest.fixture(scope="session")
def fcm_model(bench):
    from repro.core.fcm import make_model

    return make_model(bench.cfg.fcm)


@pytest.fixture(scope="session")
def table_encodings(bench, fcm_model):
    return {
        tid: fcm_model.encode_table(t) for tid, t in bench.repository.items()
    }


@pytest.fixture(scope="session")
def query_encodings(bench, fcm_model):
    return {
        q.query_id: fcm_model.encode_query(q.extracted) for q in bench.queries
    }
