"""Jaccard-containment joinable-pair job — oracle-checked (the offline
index build is the scale-bearing Spark dataflow)."""
import pandas as pd
import pytest

from repro.corpus.collection import TableCollection
from repro.discovery.containment import column_pair_overlaps, joinable_pairs
from repro.discovery.profiler import column_profiles, distinct_values
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def corp(spark):
    col = TableCollection(name="c")
    col.add("t1", pd.DataFrame({"k": list("abcde"), "v": list("vwxyz")}))
    col.add("t2", pd.DataFrame({"k": list("abcdX"), "w": list("12345")}))
    col.add("t3", pd.DataFrame({"k": list("ab"), "u": ["a", "b"]}))
    return col


def test_pair_overlaps_against_oracle(spark, corp):
    dv = distinct_values(corp.cells(spark))
    got = column_pair_overlaps(dv)
    assert_equivalent(
        got,
        """
        WITH d AS (SELECT DISTINCT "table", "column", value FROM dv)
        SELECT a."table" AS table_a, a."column" AS column_a,
               b."table" AS table_b, b."column" AS column_b,
               count(*) AS overlap
        FROM d a JOIN d b ON a.value = b.value
        WHERE a."table" || a."column" < b."table" || b."column"
        GROUP BY 1, 2, 3, 4
        """,
        dv=dv,
    )


def _pairs(spark, corp, threshold):
    cells = corp.cells(spark)
    return {
        ((r["table_a"], r["column_a"]), (r["table_b"], r["column_b"])): r
        for r in joinable_pairs(distinct_values(cells),
                                column_profiles(cells),
                                threshold=threshold).collect()
    }


def test_joinable_pairs_threshold(spark, corp):
    pairs = _pairs(spark, corp, threshold=0.8)
    # t1.k vs t2.k: overlap 4, containment 4/5 = 0.8 -> kept.
    key = (("t1", "k"), ("t2", "k"))
    assert key in pairs
    assert pairs[key]["overlap"] == 4
    assert pairs[key]["containment"] == pytest.approx(0.8)


def test_containment_directions(spark, corp):
    pairs = _pairs(spark, corp, threshold=0.5)
    # t3.k ⊂ t1.k: containment_ab vs _ba asymmetric, max = 1.0.
    row = pairs.get((("t1", "k"), ("t3", "k"))) or pairs.get(
        (("t3", "k"), ("t1", "k")))
    assert row is not None
    assert row["containment"] == pytest.approx(1.0)
    assert {round(row["containment_ab"], 3),
            round(row["containment_ba"], 3)} == {1.0, 0.4}


def test_jaccard_value(spark, corp):
    pairs = _pairs(spark, corp, threshold=0.5)
    key = (("t1", "k"), ("t2", "k"))
    assert pairs[key]["jaccard"] == pytest.approx(4 / 6)


def test_high_threshold_prunes(spark, corp):
    pairs = _pairs(spark, corp, threshold=0.95)
    assert (("t1", "k"), ("t2", "k")) not in pairs
    # subset columns still pass (containment 1.0)
    assert any("t3" in (a[0], b[0]) for a, b in pairs)


def test_intra_table_pairs_detected(spark):
    col = TableCollection(name="intra")
    col.add("t", pd.DataFrame({"x": list("abc"), "y": list("abc")}))
    pairs = _pairs(spark, col, threshold=0.8)
    assert (("t", "x"), ("t", "y")) in pairs
