"""Shared infrastructure for the spark-submit job entrypoints.

Each jobs/tableN_*.py reproduces one table of the paper's evaluation at
"bench" scale (configurable via --tiny for smoke runs). The constructed
benchmark (repository + queries + DTW ground truth) is expensive, so it
is cached on disk keyed by its config; all nine jobs share one build.
"""
from __future__ import annotations

import argparse
import hashlib
import os
import pickle
import sys

sys.path.insert(0, os.path.dirname(__file__))  # allow jobs importing _common

from pyspark.sql import SparkSession

from repro.bench.benchmark import Benchmark, build_benchmark
from repro.config import BenchmarkConfig, tiny_benchmark_config

CACHE_DIR = os.path.join(os.path.dirname(os.path.dirname(os.path.abspath(__file__))), ".bench_cache")


def get_spark() -> SparkSession:
    """Session for standalone spark-submit runs (mirrors conftest confs)."""
    return (
        SparkSession.builder.appName("repro-jobs")
        .master(os.environ.get("SPARK_MASTER", "local[*]"))
        .config("spark.sql.shuffle.partitions", os.environ.get("SPARK_SHUFFLE_PARTITIONS", "64"))
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .config("spark.driver.host", "127.0.0.1")
        .config("spark.ui.enabled", "false")
        .getOrCreate()
    )


def bench_scale_config(seed: int = 13) -> BenchmarkConfig:
    """The default bench scale (DESIGN.md §2: ~15x smaller than the paper)."""
    return BenchmarkConfig(seed=seed)


def parse_args(argv=None) -> argparse.Namespace:
    p = argparse.ArgumentParser()
    p.add_argument("--tiny", action="store_true", help="unit-test scale")
    p.add_argument("--seed", type=int, default=13)
    p.add_argument("--no-cache", action="store_true")
    return p.parse_args(argv)


def _cfg_key(cfg: BenchmarkConfig) -> str:
    return hashlib.sha256(repr(cfg).encode()).hexdigest()[:16]


def load_benchmark(
    spark: SparkSession, cfg: BenchmarkConfig, *, use_cache: bool = True, with_tpch: bool = True
) -> Benchmark:
    """Build (or load the cached) benchmark for a config."""
    os.makedirs(CACHE_DIR, exist_ok=True)
    path = os.path.join(CACHE_DIR, f"bench_{_cfg_key(cfg)}.pkl")
    if use_cache and os.path.exists(path):
        with open(path, "rb") as f:
            return pickle.load(f)
    extra = None
    if with_tpch:
        from repro.lake.repository import tpch_derived_tables

        extra = tpch_derived_tables(spark, sf=0.001, seed=cfg.seed)
    bench = build_benchmark(cfg, spark=spark, extra_tables=extra)
    if use_cache:
        with open(path, "wb") as f:
            pickle.dump(bench, f)
    return bench


def trained_fcm(
    bench: Benchmark,
    *,
    variant: str = "full",
    n_neg: int = 3,
    strategy: str = "semihard",
    epochs: int = 60,
    use_cache: bool = True,
):
    """A head-trained FCM variant for a benchmark (cached per config)."""
    from repro.bench.harness import train_fcm
    from repro.core.fcm import make_model

    os.makedirs(CACHE_DIR, exist_ok=True)
    key = _cfg_key(bench.cfg)
    path = os.path.join(
        CACHE_DIR, f"fcm_{key}_{variant}_{n_neg}_{strategy}_{epochs}.pkl"
    )
    if use_cache and os.path.exists(path):
        with open(path, "rb") as f:
            return pickle.load(f)
    model = make_model(bench.cfg.fcm, variant=variant)
    result = train_fcm(bench, model, n_neg=n_neg, strategy=strategy, epochs=epochs)
    if use_cache:
        with open(path, "wb") as f:
            pickle.dump((model, result), f)
    return model, result


def setup(argv=None, *, with_tpch: bool = True):
    """Common job prologue: args -> (spark, benchmark, args)."""
    args = parse_args(argv)
    spark = get_spark()
    cfg = tiny_benchmark_config(args.seed) if args.tiny else bench_scale_config(args.seed)
    bench = load_benchmark(spark, cfg, use_cache=not args.no_cache, with_tpch=with_tpch and not args.tiny)
    print(
        f"[bench] repository={len(bench.repository)} tables, "
        f"queries={len(bench.queries)}, k={bench.cfg.k}",
        flush=True,
    )
    return spark, bench, args
