"""DiscoveryIndex: the three Aurum API calls (paper Appendix A)."""
import pandas as pd
import pytest

from repro.core.qbe import ColumnRef
from repro.corpus.collection import TableCollection
from repro.discovery.index import (
    JoinEdge,
    JoinGraph,
    _levenshtein_at_most,
    build_index,
)


@pytest.fixture(scope="module")
def idx(spark):
    col = TableCollection(name="ix")
    col.add("orders", pd.DataFrame(
        {"oid": list("abcde"), "cust": list("12345")}))
    col.add("lines", pd.DataFrame(
        {"oid": list("abcdX"), "item": list("uvwxy")}))
    col.add("items", pd.DataFrame(
        {"item": list("uvwxz"), "price": ["9", "8", "7", "6", "5"]}))
    col.add("misc", pd.DataFrame({"blob": ["hello", "world"]}))
    return build_index(spark, col, threshold=0.8)


# -- SEARCH-KEYWORD --------------------------------------------------------

def test_search_values_exact(idx):
    assert ColumnRef("orders", "oid") in idx.search_keyword("a")
    assert ColumnRef("lines", "oid") in idx.search_keyword("a")
    assert idx.search_keyword("nope") == set()


def test_search_attributes(idx):
    got = idx.search_keyword("oid", target="attributes")
    assert got == {ColumnRef("orders", "oid"), ColumnRef("lines", "oid")}


def test_search_all_targets(idx):
    got = idx.search_keyword("item", target="all")
    # attribute name in two tables; value nowhere.
    assert ColumnRef("lines", "item") in got
    assert ColumnRef("items", "item") in got


def test_search_fuzzy(idx):
    got = idx.search_keyword("helo", fuzzy=1)
    assert ColumnRef("misc", "blob") in got
    assert idx.search_keyword("helo", fuzzy=0) == set()


def test_search_bad_target(idx):
    with pytest.raises(ValueError):
        idx.search_keyword("x", target="wat")


@pytest.mark.parametrize("a,b,d,ok", [
    ("abc", "abc", 0, True),
    ("abc", "abd", 0, False),
    ("abc", "abd", 1, True),
    ("abc", "ab", 1, True),
    ("abc", "a", 1, False),
    ("kitten", "sitting", 3, True),
    ("kitten", "sitting", 2, False),
    ("", "", 0, True),
    ("", "ab", 2, True),
])
def test_levenshtein(a, b, d, ok):
    assert _levenshtein_at_most(a, b, d) is ok


# -- NEIGHBORS -------------------------------------------------------------

def test_neighbors(idx):
    nb = idx.neighbors(ColumnRef("orders", "oid"))
    assert any(c == ColumnRef("lines", "oid") for c, _ in nb)
    scores = [s for _, s in nb]
    assert all(s >= 0.8 for s in scores)


def test_neighbors_below_build_threshold_rejected(idx):
    with pytest.raises(ValueError, match="rebuild"):
        idx.neighbors(ColumnRef("orders", "oid"), threshold=0.5)


def test_neighbors_unknown_column_empty(idx):
    assert idx.neighbors(ColumnRef("nope", "nope")) == []


# -- GENERATE-JOIN-GRAPHS --------------------------------------------------

def test_single_table_graph(idx):
    gs = idx.generate_join_graphs(["orders"])
    assert gs == [JoinGraph(frozenset({"orders"}), frozenset())]


def test_direct_join(idx):
    gs = idx.generate_join_graphs(["orders", "lines"])
    assert len(gs) >= 1
    g = gs[0]
    assert g.tables == {"orders", "lines"}
    (edge,) = g.edges
    assert {edge.a.column, edge.b.column} == {"oid"}


def test_two_hop_join(idx):
    # orders -- lines -- items within rho=2.
    gs = idx.generate_join_graphs(["orders", "items"], rho=2)
    assert gs, "expected a 2-hop path"
    assert any(g.tables == {"orders", "lines", "items"} for g in gs)


def test_one_hop_only_fails_for_distant_tables(idx):
    assert idx.generate_join_graphs(["orders", "items"], rho=1) == []


def test_non_joinable(idx):
    assert idx.generate_join_graphs(["orders", "misc"]) == []


def test_max_graphs_cap(idx):
    gs = idx.generate_join_graphs(["orders", "items"], rho=2, max_graphs=1)
    assert len(gs) == 1


def test_joinable_predicate(idx):
    assert idx.joinable("orders", "lines")
    assert not idx.joinable("orders", "items")
    assert not idx.joinable("orders", "misc")


def test_n_joinable_pairs_counts_each_pair_once(idx):
    assert idx.n_joinable_pairs >= 2  # orders-lines oid, lines-items item


def test_join_edge_canonical_order():
    a = ColumnRef("b_tab", "x")
    b = ColumnRef("a_tab", "y")
    e = JoinEdge.of(a, b, 0.9)
    assert (e.a.table, e.b.table) == ("a_tab", "b_tab")
    assert e == JoinEdge.of(b, a, 0.9)


def test_join_graph_score_prefers_small_graphs(idx):
    small = JoinGraph(frozenset({"orders"}), frozenset())
    e = JoinEdge.of(ColumnRef("orders", "oid"), ColumnRef("lines", "oid"), 0.8)
    big = JoinGraph(frozenset({"orders", "lines"}), frozenset({e}))
    assert small.score(idx.profiles) < big.score(idx.profiles)


def test_profiles_exposed(idx):
    p = idx.profiles[ColumnRef("orders", "oid")]
    assert p["n_rows"] == 5
    assert p["n_distinct"] == 5
    assert p["distinct_ratio"] == 1.0
