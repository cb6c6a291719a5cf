"""Tests for repro.bench.benchmark (Sec. VII-A construction, local path)."""
import numpy as np
import pytest

from repro.bench.benchmark import build_benchmark, make_queries
from repro.bench.plotly_lite import gen_corpus
from repro.config import tiny_benchmark_config


@pytest.fixture(scope="module")
def bench():
    # module-scoped: construction includes ground-truth DTW
    return build_benchmark(tiny_benchmark_config())


class TestRepository:
    def test_size(self, bench):
        cfg = bench.cfg
        want = cfg.n_base_tables + cfg.n_query_tables * (1 + cfg.n_dupes)
        assert len(bench.repository) == want

    def test_dupes_plotted_columns_are_noisy_copies(self, bench):
        """Plotted columns survive (with sigma in [0.9, 1.1]); the dupe's
        remapped spec points at them after the column permutation."""
        src = bench.repository["qry00000"]
        src_spec = bench.repo_specs["qry00000"]
        dup = bench.repository["qry00000_d000"]
        dup_spec = bench.repo_specs["qry00000_d000"]
        assert dup.n_rows == src.n_rows
        for s_ci, d_ci in zip(src_spec.y_cols, dup_spec.y_cols):
            s, d = src.columns[s_ci], dup.columns[d_ci]
            ratio = d / np.where(s == 0, 1, s)
            ratio = ratio[np.isfinite(ratio)]
            assert np.all((ratio >= 0.9 - 1e-9) & (ratio <= 1.1 + 1e-9))
            assert not np.allclose(d, s)

    def test_specs_for_every_table(self, bench):
        assert set(bench.repo_specs) == set(bench.repository)

    def test_dupes_keep_aggregation_spec(self, bench):
        src_spec = bench.repo_specs["qry00000"]
        dup_spec = bench.repo_specs["qry00000_d001"]
        assert dup_spec.agg_op == src_spec.agg_op
        assert dup_spec.window == src_spec.window
        assert dup_spec.m == src_spec.m


class TestQueries:
    def test_count(self, bench):
        cfg = bench.cfg
        assert len(bench.queries) == cfg.n_query_tables * cfg.charts_per_table

    def test_da_and_plain_present(self, bench):
        assert any(q.is_da for q in bench.queries)
        assert any(not q.is_da for q in bench.queries)

    def test_extraction_recovered_all_lines(self, bench):
        for q in bench.queries:
            assert q.extracted.m == q.m

    def test_query_ids_unique(self, bench):
        ids = [q.query_id for q in bench.queries]
        assert len(set(ids)) == len(ids)


class TestGroundTruth:
    def test_topk_size(self, bench):
        for q in bench.queries:
            assert len(bench.ground_truth[q.query_id]) == bench.cfg.k

    def test_source_family_dominates_plain_queries(self, bench):
        """For plain full-range queries the relevant set must be dominated
        by the source table and its noisy duplicates (the point of the
        construction). DA queries are exempt: the *aggregated* data can
        legitimately be DTW-closer to another table's raw columns — the
        paper's ground truth has the same property, which is exactly what
        makes DA queries hard (Table II)."""
        plain = [q for q in bench.queries if not q.is_da and q.spec.row_range is None]
        assert plain
        for q in plain:
            gt = bench.ground_truth[q.query_id]
            own = sum(1 for t in gt if t.startswith(q.source_table_id))
            assert own / len(gt) >= 0.5

    def test_plain_query_source_ranked_first(self, bench):
        plain = [q for q in bench.queries if not q.is_da and q.spec.row_range is None]
        for q in plain:
            gt = bench.ground_truth[q.query_id]
            assert gt[0].startswith(q.source_table_id)

    def test_deterministic(self):
        cfg = tiny_benchmark_config(seed=99)
        a = build_benchmark(cfg)
        b = build_benchmark(cfg)
        assert a.ground_truth == b.ground_truth


class TestMakeQueries:
    def test_charts_per_table_respected(self):
        cfg = tiny_benchmark_config()
        recs = gen_corpus(cfg, 3, prefix="q", seed=0)
        qs = make_queries(recs, cfg, np.random.default_rng(0))
        assert len(qs) == 3 * cfg.charts_per_table

    def test_da_spec_is_second_chart(self):
        cfg = tiny_benchmark_config()
        recs = gen_corpus(cfg, 2, prefix="q", seed=1)
        qs = make_queries(recs, cfg, np.random.default_rng(0))
        per_table = {}
        for q in qs:
            per_table.setdefault(q.source_table_id, []).append(q)
        for tid, tqs in per_table.items():
            assert not tqs[0].is_da
            assert tqs[1].is_da
