"""View-specification artifacts (Section III + VI-C1 alternatives)."""
import pytest

from repro.core.qbe import (
    ColumnRef,
    ExampleQuery,
    GroundTruthQuery,
    attribute_specification,
    keyword_specification,
)


def test_column_ref_ordering_and_str():
    a, b = ColumnRef("t1", "x"), ColumnRef("t2", "a")
    assert a < b
    assert str(a) == "t1.x"


def test_example_query_of():
    q = ExampleQuery.of(["a", "b"], ("c",))
    assert q.n_columns == 2
    assert q.columns == (("a", "b"), ("c",))


def test_example_query_hashable():
    assert hash(ExampleQuery.of(["a"])) == hash(ExampleQuery.of(["a"]))


def test_ground_truth_requires_matching_noise_columns():
    with pytest.raises(ValueError, match="noise column"):
        GroundTruthQuery(
            name="bad",
            gt_columns=[ColumnRef("t", "a"), ColumnRef("t", "b")],
            noise_columns=[ColumnRef("t", "a")],
        )


def test_ground_truth_tables_derived():
    gt = GroundTruthQuery(
        name="g",
        gt_columns=[ColumnRef("t1", "a"), ColumnRef("t2", "b")],
        noise_columns=[ColumnRef("n1", "a"), ColumnRef("n2", "b")],
    )
    assert gt.gt_tables == frozenset({"t1", "t2"})


def test_keyword_specification_single_column():
    q = keyword_specification(["population", "country"])
    assert q.n_columns == 1
    assert q.columns[0] == ("population", "country")


def test_attribute_specification_one_column_per_attribute():
    q = attribute_specification(["State", "IATA Code"])
    assert q.n_columns == 2
    assert q.columns == (("State",), ("IATA Code",))
