"""Column profiling Spark job — checked against the DuckDB oracle."""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.corpus.collection import TableCollection
from repro.discovery.profiler import column_profiles, distinct_values
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def tiny(spark):
    col = TableCollection(name="tiny")
    col.add("t1", pd.DataFrame({"a": [1, 1, 2, 3], "b": ["x", "y", "y", None]}))
    col.add("t2", pd.DataFrame({"a": [2, 3, 4], "c": ["x", "x", "x"]}))
    return col


def test_profiles_against_oracle(spark, tiny):
    cells = tiny.cells(spark)
    prof = column_profiles(cells).select(
        "table", "column", "n_rows", "n_distinct")
    assert_equivalent(
        prof,
        """
        SELECT "table", "column",
               count(value) AS n_rows,
               count(DISTINCT value) AS n_distinct
        FROM cells GROUP BY "table", "column"
        """,
        cells=cells,
    )


def test_profile_values(spark, tiny):
    prof = {(r["table"], r["column"]): r
            for r in column_profiles(tiny.cells(spark)).collect()}
    assert prof[("t1", "a")]["n_rows"] == 4
    assert prof[("t1", "a")]["n_distinct"] == 3
    assert prof[("t1", "b")]["n_rows"] == 3  # null dropped
    assert prof[("t2", "c")]["n_distinct"] == 1
    assert prof[("t2", "a")]["distinct_ratio"] == 1.0


def test_distinct_values_against_oracle(spark, tiny):
    cells = tiny.cells(spark)
    dv = distinct_values(cells)
    assert_equivalent(
        dv,
        'SELECT DISTINCT "table", "column", value FROM cells',
        cells=cells,
    )


def test_distinct_values_count(spark, tiny):
    dv = distinct_values(tiny.cells(spark))
    assert dv.count() == 3 + 2 + 3 + 1
    assert dv.where(
        (F.col("table") == "t1") & (F.col("column") == "b")
    ).count() == 2
