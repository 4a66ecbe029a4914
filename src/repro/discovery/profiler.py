"""Column profiling over the long-format cell relation (Spark job).

Profiles feed Table I (corpus characteristics), candidate-key detection
thresholds, and the containment job (which needs per-column distinct
cardinalities).
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F


def column_profiles(cells: DataFrame) -> DataFrame:
    """Per-column profile: ``(table, column, n_rows, n_distinct,
    distinct_ratio)``.

    ``distinct_ratio`` ≈ uniqueness; a ratio ≥ the key threshold marks an
    approximate key column (paper Section V, citing [28], [29]).
    """
    return (
        cells.groupBy("table", "column")
        .agg(
            F.count("value").alias("n_rows"),
            F.countDistinct("value").alias("n_distinct"),
        )
        .withColumn(
            "distinct_ratio",
            F.when(F.col("n_rows") > 0,
                   F.col("n_distinct") / F.col("n_rows")).otherwise(F.lit(0.0)),
        )
    )


def distinct_values(cells: DataFrame) -> DataFrame:
    """Distinct ``(table, column, value)`` triples — the value posting
    index (SEARCH-KEYWORD source) and the containment-join input."""
    return cells.select("table", "column", "value").distinct()
