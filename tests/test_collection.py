"""TableCollection and value normalization."""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.corpus.collection import TableCollection, normalize_value


@pytest.mark.parametrize(
    "raw,expected",
    [
        (None, None),
        (float("nan"), None),
        ("", None),
        ("  ", None),
        ("  x ", "x"),
        (5, "5"),
        (5.0, "5"),
        (5.25, "5.25"),
        (True, "True"),
        (1234567.0, "1234567"),
        ("Georgia", "Georgia"),
        (0.123456789, "0.123457"),
    ],
)
def test_normalize_value(raw, expected):
    assert normalize_value(raw) == expected


def test_int_and_float_keys_normalize_identically():
    assert normalize_value(7) == normalize_value(7.0)


@pytest.fixture()
def small_collection():
    col = TableCollection(name="t")
    col.add("a", pd.DataFrame({"x": [1, 2, 2], "y": ["p", "q", None]}))
    col.add("b", pd.DataFrame({"x": [2.0, 3.0], "z": ["r", "s"]}))
    return col


def test_counts(small_collection):
    assert small_collection.n_tables == 2
    assert small_collection.n_columns == 4
    assert small_collection.n_rows == 5


def test_columns_listing(small_collection):
    assert ("a", "x") in small_collection.columns()
    assert ("b", "z") in small_collection.columns()
    assert len(small_collection.columns()) == 4


def test_duplicate_table_rejected(small_collection):
    with pytest.raises(ValueError, match="duplicate"):
        small_collection.add("a", pd.DataFrame({"x": [1]}))


def test_values_normalized_on_add(small_collection):
    # 2 (int, table a) and 2.0 (float, table b) normalize to the same key.
    assert small_collection.tables["a"]["x"].tolist() == ["1", "2", "2"]
    assert small_collection.tables["b"]["x"].tolist() == ["2", "3"]


def test_size_bytes_positive(small_collection):
    assert small_collection.size_bytes() > 0


def test_spark_table_roundtrip(spark, small_collection):
    df = small_collection.spark_table(spark, "a")
    assert df.columns == ["x", "y"]
    assert df.count() == 3
    assert {r["x"] for r in df.collect()} == {"1", "2"}


def test_cells_long_format(spark, small_collection):
    cells = small_collection.cells(spark)
    assert cells.columns == ["table", "column", "row_id", "value"]
    # Nulls dropped: 5 rows x 2 cols = 10 cells minus one null.
    assert cells.count() == 9
    per_table = {
        r["table"]: r["n"]
        for r in cells.groupBy("table").agg(F.count("*").alias("n")).collect()
    }
    assert per_table == {"a": 5, "b": 4}


def test_cells_cached(spark, small_collection):
    c1 = small_collection.cells(spark)
    c2 = small_collection.cells(spark)
    assert c1 is c2


def test_cells_cache_invalidated_on_add(spark, small_collection):
    c1 = small_collection.cells(spark)
    small_collection.add("c", pd.DataFrame({"w": ["v"]}))
    c2 = small_collection.cells(spark)
    assert c1 is not c2
    assert c2.count() == 10
