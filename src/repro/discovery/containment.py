"""Joinable-pair discovery via Jaccard containment (Spark job).

The paper's pathless setting has no PK/FK information; Aurum (and Lazo,
LSHEnsemble) approximate join paths with **inclusion dependencies**
estimated by Jaccard containment between column value sets (Challenge 2).
This module computes them exactly with a distinct-value self-join — the
scale-bearing offline index job of the reproduction (DESIGN.md §1).
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F


def column_pair_overlaps(distinct_vals: DataFrame) -> DataFrame:
    """Pairwise distinct-value overlap between all columns sharing at
    least one value.

    Input: distinct ``(table, column, value)`` triples. Output one row
    per unordered column pair: ``(table_a, column_a, table_b, column_b,
    overlap)`` with ``(table_a, column_a) < (table_b, column_b)``.
    """
    a = distinct_vals.select(
        F.col("table").alias("table_a"),
        F.col("column").alias("column_a"),
        "value",
    )
    b = distinct_vals.select(
        F.col("table").alias("table_b"),
        F.col("column").alias("column_b"),
        "value",
    )
    key_a = F.concat_ws("", "table_a", "column_a")
    key_b = F.concat_ws("", "table_b", "column_b")
    return (
        a.join(b, on="value")
        .where(key_a < key_b)
        .groupBy("table_a", "column_a", "table_b", "column_b")
        .agg(F.count("*").alias("overlap"))
    )


def joinable_pairs(distinct_vals: DataFrame, profiles: DataFrame,
                   threshold: float = 0.8) -> DataFrame:
    """Column pairs whose **max-direction** Jaccard containment meets
    ``threshold`` — the hypergraph edges NEIGHBORS serves.

    Output columns: the pair, ``overlap``, ``containment_ab`` (=|A∩B|/|A|),
    ``containment_ba``, ``containment`` (max), ``jaccard``.
    """
    overlaps = column_pair_overlaps(distinct_vals)
    prof = profiles.select("table", "column", "n_distinct")
    out = (
        overlaps.join(
            prof.select(
                F.col("table").alias("table_a"),
                F.col("column").alias("column_a"),
                F.col("n_distinct").alias("distinct_a"),
            ),
            on=["table_a", "column_a"],
        )
        .join(
            prof.select(
                F.col("table").alias("table_b"),
                F.col("column").alias("column_b"),
                F.col("n_distinct").alias("distinct_b"),
            ),
            on=["table_b", "column_b"],
        )
        .withColumn("containment_ab", F.col("overlap") / F.col("distinct_a"))
        .withColumn("containment_ba", F.col("overlap") / F.col("distinct_b"))
        .withColumn(
            "containment", F.greatest("containment_ab", "containment_ba")
        )
        .withColumn(
            "jaccard",
            F.col("overlap")
            / (F.col("distinct_a") + F.col("distinct_b") - F.col("overlap")),
        )
    )
    return out.where(F.col("containment") >= threshold).select(
        "table_a", "column_a", "table_b", "column_b",
        "overlap", "containment_ab", "containment_ba", "containment", "jaccard",
    )
