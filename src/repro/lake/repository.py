"""The data lake as Spark DataFrames.

The repository lives in long format — one row per column:
``(table_id, col_id, values ARRAY<DOUBLE>)`` — with column statistics
(min / max / sum / length) computed by Catalyst higher-order functions,
not UDFs, so they are oracle-checkable SQL. Segment/column embeddings are
precomputed with ``mapInPandas`` (the distributed-dataflow core of this
reproduction): each executor slice featurizes its columns with the
dataset encoder and emits column-level embedding vectors for the LSH
index.

Also provides TPC-H-lite derived chartable tables (daily order/lineitem
aggregates via Spark SQL) that join the repository as realistic
distractors, tying the benchmark to ``repro.synth_data``.
"""
from __future__ import annotations

from typing import Iterable, Iterator

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F
from pyspark.sql.types import (
    ArrayType,
    DoubleType,
    IntegerType,
    StringType,
    StructField,
    StructType,
)

from repro.core.data import LakeTable

COLUMNS_SCHEMA = StructType(
    [
        StructField("table_id", StringType(), False),
        StructField("col_id", IntegerType(), False),
        StructField("values", ArrayType(DoubleType()), False),
    ]
)

EMBED_SCHEMA = StructType(
    [
        StructField("table_id", StringType(), False),
        StructField("col_id", IntegerType(), False),
        StructField("emb", ArrayType(DoubleType()), False),
    ]
)


def tables_to_pdf(tables: dict[str, LakeTable] | Iterable[LakeTable]) -> pd.DataFrame:
    """Long-format pandas frame of a table collection."""
    if isinstance(tables, dict):
        tables = tables.values()
    rows = []
    for t in tables:
        for i, c in enumerate(t.columns):
            rows.append({"table_id": t.table_id, "col_id": i, "values": list(map(float, c))})
    return pd.DataFrame(rows, columns=["table_id", "col_id", "values"])


def repository_df(spark: SparkSession, tables: dict[str, LakeTable] | Iterable[LakeTable]) -> DataFrame:
    """The repository as a Spark DataFrame (long format)."""
    pdf = tables_to_pdf(tables)
    return spark.createDataFrame(pdf, schema=COLUMNS_SCHEMA)


def with_column_stats(df: DataFrame) -> DataFrame:
    """Append Catalyst-computed per-column stats: n_rows, vmin, vmax, vsum."""
    return (
        df.withColumn("n_rows", F.size("values"))
        .withColumn("vmin", F.array_min("values"))
        .withColumn("vmax", F.array_max("values"))
        .withColumn(
            "vsum",
            F.aggregate("values", F.lit(0.0), lambda acc, x: acc + x),
        )
    )


def interval_df(df: DataFrame) -> DataFrame:
    """Per-column index intervals ``[lo, hi] = hull(min, max, sum)``
    (Sec. VI-A interval-tree keys) as a Catalyst projection."""
    stats = with_column_stats(df)
    return stats.select(
        "table_id",
        "col_id",
        F.least("vmin", "vsum").alias("lo"),
        F.greatest("vmax", "vsum").alias("hi"),
    )


def iter_tables(pdf: pd.DataFrame) -> Iterator[LakeTable]:
    """Group a long-format pandas slice back into LakeTables (UDF helper)."""
    for tid, grp in pdf.groupby("table_id", sort=False):
        grp = grp.sort_values("col_id")
        cols = [np.asarray(v, dtype=np.float64) for v in grp["values"]]
        yield LakeTable(str(tid), cols)


def embed_repository(spark_df: DataFrame, fcm_cfg) -> DataFrame:
    """Distributed column-embedding job (mapInPandas).

    Emits one row per column with its column-level embedding (the mean of
    the identity-variant segment embeddings, Sec. VI-A LSH indexing).
    """
    from repro.core.dataset_encoder import DatasetEncoder

    def run(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        enc = DatasetEncoder(fcm_cfg.without_da())
        for pdf in batches:
            out = []
            for _, row in pdf.iterrows():
                col = np.asarray(row["values"], dtype=np.float64)
                ce = enc.encode_column(col, int(row["col_id"]))
                out.append(
                    {
                        "table_id": row["table_id"],
                        "col_id": int(row["col_id"]),
                        "emb": [float(x) for x in ce.mean_emb],
                    }
                )
            yield pd.DataFrame(out, columns=["table_id", "col_id", "emb"])

    return spark_df.mapInPandas(run, schema=EMBED_SCHEMA)


# --------------------------------------------------------------------------
# TPC-H-lite derived chartable tables
# --------------------------------------------------------------------------
TPCH_DAILY_SQL = """
    SELECT l_shipdate AS day,
           SUM(l_quantity)       AS qty,
           SUM(l_extendedprice)  AS revenue,
           AVG(l_discount)       AS avg_discount
    FROM lineitem
    GROUP BY l_shipdate
    ORDER BY day
"""

ORDERS_DAILY_SQL = """
    SELECT o_orderdate AS day,
           SUM(o_totalprice) AS total,
           COUNT(*) * 1.0    AS n_orders
    FROM orders
    GROUP BY o_orderdate
    ORDER BY day
"""


def tpch_daily_df(spark: SparkSession, lineitem_df: DataFrame) -> DataFrame:
    lineitem_df.createOrReplaceTempView("lineitem")
    return spark.sql(TPCH_DAILY_SQL)


def orders_daily_df(spark: SparkSession, orders_df: DataFrame) -> DataFrame:
    orders_df.createOrReplaceTempView("orders")
    return spark.sql(ORDERS_DAILY_SQL)


def tpch_derived_tables(spark: SparkSession, *, sf: float = 0.001, seed: int = 0) -> dict[str, LakeTable]:
    """Chartable tables derived from TPC-H-lite via Spark SQL aggregates.

    They join the repository as realistic business-series distractors.
    """
    from repro import synth_data

    li = synth_data.lineitem(spark, sf=sf, seed=seed)
    od = synth_data.orders(spark, sf=sf, seed=seed + 1)
    daily = tpch_daily_df(spark, li).toPandas()
    odaily = orders_daily_df(spark, od).toPandas()
    out = {}
    out["tpch_lineitem_daily"] = LakeTable(
        "tpch_lineitem_daily",
        [
            daily["qty"].to_numpy(dtype=np.float64),
            daily["revenue"].to_numpy(dtype=np.float64),
            daily["avg_discount"].to_numpy(dtype=np.float64),
        ],
        names=["qty", "revenue", "avg_discount"],
    )
    out["tpch_orders_daily"] = LakeTable(
        "tpch_orders_daily",
        [
            odaily["total"].to_numpy(dtype=np.float64),
            odaily["n_orders"].to_numpy(dtype=np.float64),
        ],
        names=["total", "n_orders"],
    )
    return out
