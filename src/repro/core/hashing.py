"""Row-wise view hashing for 4C (paper Algorithm 3, phase 1).

All candidate views of one schema block are unioned into a single Spark
DataFrame and hashed in one pass with ``xxhash64`` over the concatenated
row — "hashing dominates runtime" in the paper's Fig 4(a), so this is
the batched, distributed hot path. The hash map H(V) (view → set of row
hashes) backs compatibility/containment checks and the contradiction
inverted index.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F
from pyspark.sql import types as T

from repro.core.materializer import MaterializedView

#: Unit separator — cannot occur in normalized cell values.
_ROW_SEP = "\x1f"
VIEW_ID = "__view_id__"
ROW_HASH = "__row_hash__"


def block_frame(spark: SparkSession,
                views: list[MaterializedView]) -> DataFrame:
    """Union all views of one schema block into a tagged long DataFrame
    ``(VIEW_ID, <block columns...>)``. All views must share a schema."""
    schema = views[0].schema_key
    if any(v.schema_key != schema for v in views):
        raise ValueError("block_frame requires a single schema block")
    parts = []
    for v in views:
        pdf = v.df.copy()
        pdf.insert(0, VIEW_ID, v.view_id)
        parts.append(pdf)
    union = pd.concat(parts, ignore_index=True)
    spark_schema = T.StructType(
        [T.StructField(VIEW_ID, T.LongType(), False)]
        + [T.StructField(c, T.StringType(), True) for c in schema]
    )
    return spark.createDataFrame(union, schema=spark_schema)


def with_row_hash(frame: DataFrame) -> DataFrame:
    """Append the row hash column: xxhash64 over the concatenated row."""
    cols = [c for c in frame.columns if c != VIEW_ID]
    return frame.withColumn(
        ROW_HASH, F.xxhash64(F.concat_ws(_ROW_SEP, *[F.col(c) for c in cols]))
    )


def hash_sets(frame: DataFrame) -> DataFrame:
    """H(V): distinct ``(VIEW_ID, ROW_HASH)`` pairs for every view."""
    return with_row_hash(frame).select(VIEW_ID, ROW_HASH).distinct()


def pairwise_intersections(hashes: DataFrame) -> DataFrame:
    """|H(Vi) ∩ H(Vj)| for every view pair sharing ≥1 row hash — one
    self-join, the containment/compatibility workhorse. Returns
    ``(view_a, view_b, overlap)`` with ``view_a < view_b``."""
    a = hashes.select(F.col(VIEW_ID).alias("view_a"),
                      F.col(ROW_HASH).alias("h"))
    b = hashes.select(F.col(VIEW_ID).alias("view_b"),
                      F.col(ROW_HASH).alias("h"))
    return (
        a.join(b, on="h")
        .where(F.col("view_a") < F.col("view_b"))
        .groupBy("view_a", "view_b")
        .agg(F.count("*").alias("overlap"))
    )
