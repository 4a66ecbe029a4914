"""A pathless table collection (paper Definition 2).

A collection is a named set of noisy tables with **no** join-path
information. Tables are small-and-many (web-table / open-data style), so
the catalog itself lives in pandas; everything scale-bearing (profiling,
containment, 4C hashing, materialization) runs on Spark over either the
long-format *cell* DataFrame produced here or per-table Spark frames.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F
from pyspark.sql import types as T

#: Schema of the long-format cell relation: one row per (table, column, row, value).
CELL_SCHEMA = T.StructType(
    [
        T.StructField("table", T.StringType(), False),
        T.StructField("column", T.StringType(), False),
        T.StructField("row_id", T.LongType(), False),
        T.StructField("value", T.StringType(), True),
    ]
)


def normalize_value(v) -> str | None:
    """Canonical string form of a cell value.

    The discovery index matches values across heterogeneous tables, so
    ints/floats/strings must normalize identically everywhere (query
    examples included). Floats with integral value render as ints so a
    key stored as ``5`` in one table joins ``5.0`` in another.
    """
    if v is None or (isinstance(v, float) and pd.isna(v)):
        return None
    if isinstance(v, float):
        if v.is_integer():
            return str(int(v))
        return f"{v:.6g}"
    if isinstance(v, bool):
        return str(v)
    if isinstance(v, int):
        return str(v)
    s = str(v).strip()
    return s if s else None


@dataclass
class TableCollection:
    """Catalog of noisy tables plus lazily-built Spark representations."""

    name: str
    tables: dict[str, pd.DataFrame] = field(default_factory=dict)
    _cells_cache: DataFrame | None = field(default=None, repr=False, compare=False)

    def add(self, name: str, df: pd.DataFrame) -> None:
        """Register a table. Column values are normalized to strings."""
        if name in self.tables:
            raise ValueError(f"duplicate table name: {name}")
        norm = pd.DataFrame(
            {c: [normalize_value(v) for v in df[c]] for c in df.columns}
        )
        self.tables[name] = norm
        self._cells_cache = None

    @property
    def n_tables(self) -> int:
        return len(self.tables)

    @property
    def n_columns(self) -> int:
        return sum(len(t.columns) for t in self.tables.values())

    @property
    def n_rows(self) -> int:
        return sum(len(t) for t in self.tables.values())

    def size_bytes(self) -> int:
        """In-memory footprint of the catalog (Table I 'Size' proxy)."""
        return int(
            sum(t.memory_usage(deep=True).sum() for t in self.tables.values())
        )

    def columns(self) -> list[tuple[str, str]]:
        """All (table, column) pairs in the collection."""
        return [(t, c) for t, df in self.tables.items() for c in df.columns]

    def spark_table(self, spark: SparkSession, name: str) -> DataFrame:
        """One repository table as a Spark DataFrame (all-string columns)."""
        pdf = self.tables[name]
        schema = T.StructType(
            [T.StructField(c, T.StringType(), True) for c in pdf.columns]
        )
        return spark.createDataFrame(pdf, schema=schema)

    def cells(self, spark: SparkSession) -> DataFrame:
        """Long-format cell DataFrame ``(table, column, row_id, value)``.

        This is the input to every offline index job (profiling,
        value-posting index, containment). Cached per collection; the
        cache is Spark-side (``.cache()``) because several index jobs
        scan it.
        """
        if self._cells_cache is not None:
            return self._cells_cache
        frames = []
        for tname, pdf in self.tables.items():
            melted = pdf.reset_index(names="row_id").melt(
                id_vars="row_id", var_name="column", value_name="value"
            )
            melted.insert(0, "table", tname)
            frames.append(melted[["table", "column", "row_id", "value"]])
        long = pd.concat(frames, ignore_index=True)
        long["row_id"] = long["row_id"].astype("int64")
        cells = spark.createDataFrame(long, schema=CELL_SCHEMA)
        self._cells_cache = cells.where(F.col("value").isNotNull()).cache()
        return self._cells_cache
