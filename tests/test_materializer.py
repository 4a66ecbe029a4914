"""MATERIALIZER: Spark engine vs pandas engine vs the DuckDB oracle."""
import pandas as pd
import pytest

from repro.core.join_graph_search import ViewSpec
from repro.core.materializer import (
    MaterializedView,
    materialize_pandas,
    materialize_spark,
    materialize_views,
    output_names,
)
from repro.core.qbe import ColumnRef
from repro.corpus.collection import TableCollection
from repro.discovery.index import JoinEdge, JoinGraph
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def corp():
    col = TableCollection(name="m")
    col.add("orders", pd.DataFrame({
        "oid": ["o1", "o2", "o3", "o4"],
        "cust": ["c1", "c2", "c1", "c3"],
        "status": ["A", "B", "A", "B"],
    }))
    col.add("lines", pd.DataFrame({
        "oid": ["o1", "o1", "o2", "o9"],
        "item": ["i1", "i2", "i1", "i3"],
    }))
    col.add("items", pd.DataFrame({
        "item": ["i1", "i2"],
        "price": ["10", "20"],
    }))
    return col


def _edge(t1, c1, t2, c2):
    return JoinEdge.of(ColumnRef(t1, c1), ColumnRef(t2, c2), 1.0)


@pytest.fixture(scope="module")
def join_spec(corp):
    g = JoinGraph(frozenset({"orders", "lines"}),
                  frozenset({_edge("orders", "oid", "lines", "oid")}))
    return ViewSpec(g, (ColumnRef("orders", "status"),
                        ColumnRef("lines", "item")))


@pytest.fixture(scope="module")
def two_hop_spec(corp):
    g = JoinGraph(
        frozenset({"orders", "lines", "items"}),
        frozenset({_edge("orders", "oid", "lines", "oid"),
                   _edge("lines", "item", "items", "item")}),
    )
    return ViewSpec(g, (ColumnRef("orders", "cust"),
                        ColumnRef("items", "price")))


def test_spark_against_oracle(spark, corp, join_spec):
    got = materialize_spark(spark, corp, join_spec)
    assert_equivalent(
        got,
        """
        SELECT DISTINCT o.status AS status, l.item AS item
        FROM orders o JOIN lines l ON o.oid = l.oid
        """,
        orders=corp.tables["orders"],
        lines=corp.tables["lines"],
    )


def test_two_hop_spark_against_oracle(spark, corp, two_hop_spec):
    got = materialize_spark(spark, corp, two_hop_spec)
    assert_equivalent(
        got,
        """
        SELECT DISTINCT o.cust AS cust, i.price AS price
        FROM orders o JOIN lines l ON o.oid = l.oid
                      JOIN items i ON l.item = i.item
        """,
        orders=corp.tables["orders"],
        lines=corp.tables["lines"],
        items=corp.tables["items"],
    )


@pytest.mark.parametrize("spec_name", ["join_spec", "two_hop_spec"])
def test_pandas_matches_spark(spark, corp, spec_name, request):
    spec = request.getfixturevalue(spec_name)
    via_spark = (
        materialize_spark(spark, corp, spec)
        .toPandas().sort_values(list(output_names(spec, corp)))
        .reset_index(drop=True)
    )
    via_pandas = (
        materialize_pandas(corp, spec)
        .sort_values(list(output_names(spec, corp)))
        .reset_index(drop=True)
    )
    pd.testing.assert_frame_equal(via_spark, via_pandas)


def test_single_table_projection(corp):
    spec = ViewSpec(JoinGraph(frozenset({"orders"}), frozenset()),
                    (ColumnRef("orders", "cust"),
                     ColumnRef("orders", "status")))
    got = materialize_pandas(corp, spec)
    assert list(got.columns) == ["cust", "status"]
    # set semantics: (c1,A) appears twice in the base table
    assert len(got) == 3


def test_set_semantics_dedup(corp):
    spec = ViewSpec(JoinGraph(frozenset({"orders"}), frozenset()),
                    (ColumnRef("orders", "status"),))
    got = materialize_pandas(corp, spec)
    assert sorted(got["status"]) == ["A", "B"]


def test_project_all_whole_table(corp):
    spec = ViewSpec(JoinGraph(frozenset({"lines"}), frozenset()),
                    (ColumnRef("lines", "oid"),), project_all=True)
    got = materialize_pandas(corp, spec)
    assert list(got.columns) == ["oid", "item"]
    assert len(got) == 4


def test_output_name_collision_suffixed(corp):
    spec = ViewSpec(
        JoinGraph(frozenset({"orders", "lines"}),
                  frozenset({_edge("orders", "oid", "lines", "oid")})),
        (ColumnRef("orders", "oid"), ColumnRef("lines", "oid")),
    )
    assert output_names(spec, corp) == ["oid", "oid__2"]
    got = materialize_pandas(corp, spec)
    assert list(got.columns) == ["oid", "oid__2"]


def test_materialize_views_drops_empty(corp):
    bad = ViewSpec(
        JoinGraph(frozenset({"orders", "items"}),
                  frozenset({_edge("orders", "oid", "items", "item")})),
        (ColumnRef("orders", "cust"), ColumnRef("items", "price")),
    )
    got = materialize_views(corp, [bad])
    assert got == []


def test_materialize_views_assigns_sequential_ids(corp, join_spec,
                                                  two_hop_spec):
    got = materialize_views(corp, [join_spec, two_hop_spec])
    assert [v.view_id for v in got] == [0, 1]
    assert all(isinstance(v, MaterializedView) for v in got)


def test_spark_engine_requires_session(corp, join_spec):
    with pytest.raises(ValueError, match="spark session required"):
        materialize_views(corp, [join_spec], engine="spark")


def test_unknown_engine_rejected(corp, join_spec):
    with pytest.raises(ValueError, match="unknown engine"):
        materialize_views(corp, [join_spec], engine="polars")


def test_disconnected_graph_raises(corp):
    g = JoinGraph(frozenset({"orders", "items"}), frozenset())
    spec = ViewSpec(g, (ColumnRef("orders", "cust"),
                        ColumnRef("items", "price")))
    with pytest.raises(ValueError, match="disconnected"):
        materialize_pandas(corp, spec)


def test_engines_agree_on_corpus_views(spark, wdc, wdc_index):
    """Spot-check engine equivalence on real corpus join graphs."""
    from repro.core.column_selection import candidates_for_query
    from repro.core.join_graph_search import join_graph_search
    from repro.core.qbe import ExampleQuery

    col, _ = wdc
    q = ExampleQuery.of(["Georgia", "Indiana", "Virginia"],
                        ["Georgia Daily Times", "Indiana Daily Times",
                         "Virginia Daily Times"])
    search = join_graph_search(wdc_index, candidates_for_query(wdc_index, q))
    specs = search.views[:5]
    via_pandas = materialize_views(col, specs, engine="pandas")
    via_spark = materialize_views(col, specs, spark=spark, engine="spark")
    assert len(via_pandas) == len(via_spark)
    for a, b in zip(via_pandas, via_spark):
        cols = list(a.df.columns)
        pa = a.df.sort_values(cols).reset_index(drop=True)
        pb = b.df[cols].sort_values(cols).reset_index(drop=True)
        pd.testing.assert_frame_equal(pa, pb)
