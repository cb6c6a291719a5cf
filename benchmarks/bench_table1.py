"""Table I benchmark: corpus generation + benchmark statistics."""
from repro.bench.plotly_lite import gen_corpus, m_bucket_label
from repro.config import tiny_benchmark_config


def test_corpus_generation(benchmark):
    cfg = tiny_benchmark_config()
    recs = benchmark(gen_corpus, cfg, 20, prefix="b", seed=0)
    assert len(recs) == 20


def test_m_distribution_stats(benchmark, bench):
    def stats():
        counts = {}
        for tid in bench.repository:
            m = bench.repo_specs[tid].m
            counts[m_bucket_label(m)] = counts.get(m_bucket_label(m), 0) + 1
        return counts

    counts = benchmark(stats)
    assert sum(counts.values()) == len(bench.repository)
