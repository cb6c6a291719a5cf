"""Spark tests: distributed index candidate generation equals the
driver-side data structures (interval tree / LSH), plus oracle checks."""
import numpy as np
import pandas as pd
import pytest

from repro.config import FCMConfig
from repro.core.data import LakeTable
from repro.index.interval_tree import (
    build_table_interval_tree,
    interval_tree_candidates,
    pad_query_range,
    spark_interval_candidates,
)
from repro.index.lsh import LSHIndex, spark_lsh_candidates
from repro.lake.repository import embed_repository, interval_df, repository_df
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def tables():
    rng = np.random.default_rng(3)
    out = {}
    for i in range(12):
        base = rng.uniform(-500, 500)
        out[f"t{i}"] = LakeTable(
            f"t{i}", [base + np.cumsum(rng.standard_normal(64)) for _ in range(2)]
        )
    return out


@pytest.fixture(scope="module")
def repo(spark, tables):
    return repository_df(spark, tables).cache()


class TestSparkIntervalCandidates:
    def test_matches_interval_tree(self, repo, tables):
        tree = build_table_interval_tree(tables)
        queries = []
        rng = np.random.default_rng(0)
        for i in range(5):
            lo = rng.uniform(-600, 500)
            queries.append((f"q{i}", (lo, lo + rng.uniform(1, 300))))
        got = spark_interval_candidates(interval_df(repo), queries)
        for qid, yr in queries:
            want = interval_tree_candidates(tree, yr)
            assert got[qid] == want

    def test_filter_vs_oracle(self, spark, repo, tables):
        """The Catalyst overlap predicate == the same SQL in DuckDB."""
        ivals = interval_df(repo)
        qlo, qhi = pad_query_range((0.0, 100.0))
        hits = (
            ivals.filter((ivals.lo <= qhi) & (ivals.hi >= qlo))
            .select("table_id")
            .distinct()
        )
        assert_equivalent(
            hits,
            f"""
            SELECT DISTINCT table_id FROM ivals
            WHERE lo <= {qhi} AND hi >= {qlo}
            """,
            ivals=ivals,
        )


class TestSparkLSHCandidates:
    def test_matches_driver_index(self, spark, repo, tables):
        cfg = FCMConfig()
        emb_pdf = embed_repository(repo, cfg).toPandas()
        # driver-side index over the same embeddings
        dim = len(emb_pdf.iloc[0]["emb"])
        idx = LSHIndex(dim, n_bits=8, n_tables=4, seed=5)
        for _, row in emb_pdf.iterrows():
            idx.add(row["table_id"], np.asarray(row["emb"]))
        rng = np.random.default_rng(1)
        queries = [(f"q{i}", rng.standard_normal(dim)) for i in range(4)]
        got = spark_lsh_candidates(
            embed_repository(repo, cfg), queries, n_bits=8, n_tables=4, seed=5
        )
        for qid, vec in queries:
            assert got[qid] == idx.query(vec)

    def test_empty_repository(self, spark):
        from repro.lake.repository import COLUMNS_SCHEMA

        empty = spark.createDataFrame([], schema=COLUMNS_SCHEMA)
        out = spark_lsh_candidates(
            embed_repository(empty, FCMConfig()), [("q", np.ones(4))]
        )
        assert out == {"q": set()}
