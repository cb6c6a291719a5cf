"""Distributed query scoring and ranking over the lake.

The scan+similarity-match core: a broadcast query payload is scored
against every repository table with ``applyInPandas`` grouped by
``table_id`` (each table is encoded once and scored against *all*
queries), then top-k and the prec/ndcg aggregation run as Spark SQL
window functions. The DuckDB oracle cross-checks the relational parts in
tests.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F
from pyspark.sql.types import (
    DoubleType,
    StringType,
    StructField,
    StructType,
)
from pyspark.sql.window import Window

from repro.baselines.base import Method
from repro.lake.repository import iter_tables, repository_df

SCORES_SCHEMA = StructType(
    [
        StructField("query_id", StringType(), False),
        StructField("table_id", StringType(), False),
        StructField("score", DoubleType(), False),
    ]
)


def spark_ground_truth(spark: SparkSession, bench) -> dict[str, list[str]]:
    """Ground-truth Rel(D, T) top-k per query, distributed over tables."""
    from repro.core.relevance import rel_score

    payload = [(q.query_id, [np.asarray(d) for d in q.data]) for q in bench.queries]
    bc = spark.sparkContext.broadcast(payload)
    repo = repository_df(spark, bench.repository).repartition(
        max(spark.sparkContext.defaultParallelism * 2, 8), "table_id"
    )

    def score_group(pdf: pd.DataFrame) -> pd.DataFrame:
        rows = []
        for table in iter_tables(pdf):
            for qid, data in bc.value:
                rows.append(
                    {
                        "query_id": qid,
                        "table_id": table.table_id,
                        "score": rel_score(data, table),
                    }
                )
        return pd.DataFrame(rows, columns=["query_id", "table_id", "score"])

    scores = repo.groupBy("table_id").applyInPandas(score_group, schema=SCORES_SCHEMA)
    return ranked_topk(scores, bench.cfg.k)


def score_with_method(
    spark: SparkSession,
    repository,
    queries,
    method: Method,
    *,
    candidates: dict[str, set[str]] | None = None,
    repo_df: DataFrame | None = None,
) -> DataFrame:
    """Score every (query, table) pair with ``method``.

    ``candidates`` optionally restricts scoring per query (index pruning,
    Sec. VI-A): table_ids absent from a query's candidate set are skipped.
    Returns a DataFrame (query_id, table_id, score).
    """
    preps = [(q.query_id, method.prepare_query(q.extracted)) for q in queries]
    bc = spark.sparkContext.broadcast((method, preps, candidates))
    if repo_df is None:
        if candidates is not None:
            # index pruning: only ship tables some query still needs —
            # this is where the Table VIII speedup comes from
            union = set().union(*candidates.values()) if candidates else set()
            repository = {
                tid: t for tid, t in dict(repository).items() if tid in union
            }
        repo_df = repository_df(spark, repository)
    repo_df = repo_df.repartition(
        max(spark.sparkContext.defaultParallelism * 2, 8), "table_id"
    )

    def score_group(pdf: pd.DataFrame) -> pd.DataFrame:
        mth, q_preps, cands = bc.value
        rows = []
        for table in iter_tables(pdf):
            enc = None
            for qid, prep in q_preps:
                if cands is not None and table.table_id not in cands.get(qid, ()):
                    continue
                if enc is None:
                    enc = mth.encode_table(table)
                rows.append(
                    {
                        "query_id": qid,
                        "table_id": table.table_id,
                        "score": float(mth.score(prep, enc)),
                    }
                )
        return pd.DataFrame(rows, columns=["query_id", "table_id", "score"])

    return repo_df.groupBy("table_id").applyInPandas(score_group, schema=SCORES_SCHEMA)


def topk_df(scores: DataFrame, k: int) -> DataFrame:
    """Top-k rows per query by score (deterministic tie-break on id)."""
    w = Window.partitionBy("query_id").orderBy(
        F.desc("score"), F.asc("table_id")
    )
    return (
        scores.withColumn("rank", F.row_number().over(w))
        .filter(F.col("rank") <= k)
    )


def ranked_topk(scores: DataFrame, k: int) -> dict[str, list[str]]:
    """Collect the top-k ranking per query as {query_id: [table_id, ...]}."""
    rows = topk_df(scores, k).select("query_id", "table_id", "rank").collect()
    out: dict[str, list[tuple[int, str]]] = {}
    for r in rows:
        out.setdefault(r["query_id"], []).append((r["rank"], r["table_id"]))
    return {q: [t for _, t in sorted(v)] for q, v in out.items()}


def metrics_df(
    spark: SparkSession,
    scores: DataFrame,
    ground_truth: dict[str, list[str]],
    k: int,
) -> DataFrame:
    """Per-query prec@k and ndcg@k computed in Spark SQL.

    Binary relevance against the ground-truth set; ndcg uses the standard
    log2 positional discount with ideal DCG of min(k, |relevant|) hits.
    """
    gt_rows = [
        {"query_id": q, "table_id": t}
        for q, tids in ground_truth.items()
        for t in tids
    ]
    gt = spark.createDataFrame(pd.DataFrame(gt_rows, columns=["query_id", "table_id"]))
    top = topk_df(scores, k).alias("s")
    joined = top.join(
        gt.withColumn("rel", F.lit(1.0)).alias("g"),
        on=["query_id", "table_id"],
        how="left",
    ).withColumn("rel", F.coalesce("rel", F.lit(0.0)))
    gains = joined.withColumn(
        "gain", F.col("rel") / F.log2(F.col("rank") + F.lit(1.0))
    )
    idcg = {
        q: float(np.sum(1.0 / np.log2(np.arange(2, min(k, len(t)) + 2))))
        for q, t in ground_truth.items()
    }
    idcg_df = spark.createDataFrame(
        pd.DataFrame(
            [{"query_id": q, "idcg": v} for q, v in idcg.items()],
            columns=["query_id", "idcg"],
        )
    )
    return (
        gains.groupBy("query_id")
        .agg(
            (F.sum("rel") / F.lit(float(k))).alias("prec"),
            F.sum("gain").alias("dcg"),
        )
        .join(idcg_df, on="query_id")
        .withColumn("ndcg", F.col("dcg") / F.col("idcg"))
        .select("query_id", "prec", "ndcg")
    )


def evaluate_scores(
    spark: SparkSession,
    scores: DataFrame,
    ground_truth: dict[str, list[str]],
    k: int,
) -> dict[str, float]:
    """Mean prec@k / ndcg@k over queries (Spark-side aggregation)."""
    per_q = metrics_df(spark, scores, ground_truth, k)
    row = per_q.agg(
        F.avg("prec").alias("prec"), F.avg("ndcg").alias("ndcg")
    ).collect()[0]
    return {"prec": float(row["prec"] or 0.0), "ndcg": float(row["ndcg"] or 0.0)}
