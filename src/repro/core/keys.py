"""Approximate candidate-key identification (paper Section V).

A candidate key K(V) uniquely identifies each row of V (Definition 7).
Following the fast single-column reduction of the key-discovery work the
paper cites ([28], [29]), a column is an (approximate) candidate key
when its distinct-value ratio meets ``threshold`` (1.0 = exact key).
Computed for a whole schema block in one Spark aggregation.
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.core.hashing import VIEW_ID


def candidate_keys(block: DataFrame,
                   threshold: float = 1.0) -> dict[int, list[str]]:
    """Candidate key columns per view id for one schema-block frame.

    Returns ``{view_id: [key column, ...]}``; views with no qualifying
    column map to an empty list (the paper's Q5 case — no valid keys, so
    no complementary unions).
    """
    cols = [c for c in block.columns if c != VIEW_ID]
    aggs = [F.count(F.lit(1)).alias("__n__")]
    for c in cols:
        aggs.append(F.countDistinct(F.col(c)).alias(f"__d__{c}"))
    rows = block.groupBy(VIEW_ID).agg(*aggs).collect()
    out: dict[int, list[str]] = {}
    for r in rows:
        n = r["__n__"]
        keys = [c for c in cols
                if n > 0 and r[f"__d__{c}"] / n >= threshold]
        out[int(r[VIEW_ID])] = keys
    return out
