"""Table VI benchmark: dataset encoding cost with vs without DA layers."""
import numpy as np
import pytest

from repro.core.data import LakeTable
from repro.core.dataset_encoder import DatasetEncoder
from repro.config import FCMConfig


@pytest.fixture(scope="module")
def table():
    rng = np.random.default_rng(0)
    return LakeTable("t", [np.cumsum(rng.standard_normal(512)) for _ in range(4)])


def test_encode_with_da_layers(benchmark, table):
    enc = DatasetEncoder(FCMConfig())
    te = benchmark(enc.encode_table, table)
    assert all(len(c.variants) > 1 for c in te.columns)


def test_encode_without_da_layers(benchmark, table):
    enc = DatasetEncoder(FCMConfig().without_da())
    te = benchmark(enc.encode_table, table)
    assert all(len(c.variants) == 1 for c in te.columns)
