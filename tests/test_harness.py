"""Integration tests for repro.bench.harness (the experiment driver)."""
import numpy as np
import pytest

from repro.bench.benchmark import build_benchmark
from repro.bench.harness import (
    FCMMethod,
    bucketed_metrics,
    build_triplets,
    da_breakdown_metrics,
    da_split_metrics,
    default_methods,
    m_bucket_metrics,
    overall_metrics,
    run_method,
    sub_benchmark,
    train_fcm,
)
from repro.config import tiny_benchmark_config
from repro.core.fcm import make_model


@pytest.fixture(scope="module")
def bench(spark):
    return build_benchmark(tiny_benchmark_config(seed=5), spark=spark)


@pytest.fixture(scope="module")
def fcm_run(spark, bench):
    return run_method(spark, bench, FCMMethod(make_model(bench.cfg.fcm)))


class TestRunMethod:
    def test_rankings_complete(self, fcm_run, bench):
        assert set(fcm_run.rankings) == {q.query_id for q in bench.queries}
        assert fcm_run.seconds > 0
        assert fcm_run.n_pairs == len(bench.queries) * len(bench.repository)

    def test_candidate_pruned_run(self, spark, bench):
        cands = {
            q.query_id: {q.source_table_id, f"{q.source_table_id}_d000"}
            for q in bench.queries
        }
        run = run_method(
            spark, bench, FCMMethod(make_model(bench.cfg.fcm)), candidates=cands
        )
        assert run.n_pairs == 2 * len(bench.queries)
        for qid, ranked in run.rankings.items():
            assert len(ranked) <= 2


class TestMetricBreakdowns:
    def test_overall_bounds(self, fcm_run, bench):
        m = overall_metrics(fcm_run, bench)
        assert 0.0 <= m["prec"] <= 1.0
        assert 0.0 <= m["ndcg"] <= 1.0

    def test_da_split_covers_all(self, fcm_run, bench):
        split = da_split_metrics(fcm_run, bench)
        assert set(split) == {"Overall", "With DA", "Without DA"}

    def test_m_buckets_valid_labels(self, fcm_run, bench):
        mm = m_bucket_metrics(fcm_run, bench)
        assert set(mm) <= {"1", "2-4", "5-7", ">7"}
        assert mm

    def test_da_breakdown_only_da_queries(self, fcm_run, bench):
        cells = da_breakdown_metrics(fcm_run, bench)
        n_da = sum(1 for q in bench.queries if q.is_da)
        assert sum(1 for _ in cells) <= n_da
        for (op, wlabel), v in cells.items():
            assert op in ("avg", "sum", "max", "min")
            assert 0.0 <= v <= 1.0

    def test_bucket_fn_none_skips(self, fcm_run, bench):
        out = bucketed_metrics(fcm_run, bench, lambda q: None)
        assert out == {}


class TestSubBenchmark:
    def test_keeps_ground_truth_tables(self, bench):
        sub = sub_benchmark(bench, n_queries=2, n_distractors=5)
        assert len(sub.queries) == 2
        for q in sub.queries:
            for tid in sub.ground_truth[q.query_id]:
                assert tid in sub.repository

    def test_smaller_than_original(self, bench):
        sub = sub_benchmark(bench, n_queries=2, n_distractors=5)
        assert len(sub.repository) < len(bench.repository)


class TestDefaultMethods:
    def test_five_methods(self, bench):
        methods = default_methods(bench)
        assert [m.name for m in methods] == ["CML", "DE-LN", "Opt-LN", "Qetch*", "FCM"]


class TestTraining:
    def test_build_triplets_consistent(self, bench):
        model = make_model(bench.cfg.fcm)
        triplets, encs, tables = build_triplets(bench, model)
        assert len(triplets) == 2 * (
            len(bench.train_records) + len(bench.val_records)
        )
        assert set(encs) == set(tables)
        for t in triplets:
            assert t.table_id in tables

    def test_train_fcm_improves_or_matches_default(self, spark, bench):
        model = make_model(bench.cfg.fcm)
        res = train_fcm(bench, model, epochs=30, seed=0)
        assert len(res.history) == 30
        run = run_method(spark, bench, FCMMethod(model, name="FCM-trained"))
        m = overall_metrics(run, bench)
        assert m["prec"] > 0.3  # trained head must still rank sanely
