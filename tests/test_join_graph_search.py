"""JOIN-GRAPH-SEARCH (Algorithm 5)."""
import pytest

from repro.core.column_selection import candidates_for_query, column_selection
from repro.core.join_graph_search import ViewSpec, join_graph_search
from repro.core.qbe import ColumnRef, ExampleQuery
from repro.corpus import NoiseLevel, noisy_query


@pytest.fixture(scope="module")
def wdc_q2_search(wdc, wdc_index):
    col, queries = wdc
    q = noisy_query(col, queries[1], NoiseLevel.ZERO, seed=0)
    cands = candidates_for_query(wdc_index, q)
    return join_graph_search(wdc_index, cands)


def test_empty_candidates_empty_result(wdc_index):
    got = join_graph_search(wdc_index, candidates_for_query(
        wdc_index, ExampleQuery.of(["no-such-value"], ["Georgia"])))
    assert got.views == []
    assert got.n_join_graphs == 0


def test_search_produces_views(wdc_q2_search):
    assert wdc_q2_search.n_views > 0
    assert wdc_q2_search.n_join_graphs >= wdc_q2_search.n_views


def test_projection_tables_inside_graph(wdc_q2_search):
    for v in wdc_q2_search.views:
        assert {c.table for c in v.projection} <= v.graph.tables


def test_projection_matches_query_arity(wdc_q2_search):
    for v in wdc_q2_search.views:
        assert len(v.projection) == 2
        assert not v.project_all


def test_stats_fields(wdc_q2_search):
    s = wdc_q2_search
    assert s.n_joinable_groups >= 1
    assert s.n_combos > 0
    assert s.n_pruned_combos >= 0


def test_k_caps_views(wdc, wdc_index):
    col, queries = wdc
    q = noisy_query(col, queries[1], NoiseLevel.ZERO, seed=0)
    cands = candidates_for_query(wdc_index, q)
    capped = join_graph_search(wdc_index, cands, k=3)
    assert capped.n_views == 3


def test_ranking_prefers_smaller_graphs(wdc_q2_search):
    sizes = [v.graph.n_edges for v in wdc_q2_search.views]
    # Ranked output: single-table / 1-hop graphs come before 2-hop ones.
    assert sizes == sorted(sizes)


def test_single_column_query_views_are_whole_tables(wdc_index):
    q = ExampleQuery.of(["Georgia", "Indiana", "Virginia"])
    got = join_graph_search(wdc_index, candidates_for_query(wdc_index, q))
    assert got.n_views > 0
    tables = [v.projection[0].table for v in got.views]
    assert len(tables) == len(set(tables)), "one view per table for tau=1"
    assert all(v.project_all for v in got.views)
    assert all(v.graph.edges == frozenset() for v in got.views)


def test_non_joinable_cache_prunes(wdc_index):
    # airports_full and a junk web table share no joinable column pair.
    cands = [
        type("C", (), {"selected": {ColumnRef("airports_full", "State")}})(),
        type("C", (), {"selected": {ColumnRef("web_0000", "Text")}})(),
    ]
    got = join_graph_search(wdc_index, cands)
    assert got.n_views == 0
    assert got.n_pruned_combos == 1


def test_schema_key(wdc_q2_search):
    v = wdc_q2_search.views[0]
    assert isinstance(v, ViewSpec)
    assert v.schema_key == tuple(c.column for c in v.projection)


def test_max_combos_cap(wdc, wdc_index):
    col, queries = wdc
    q = noisy_query(col, queries[2], NoiseLevel.ZERO, seed=0)
    cands = candidates_for_query(wdc_index, q)
    small = join_graph_search(wdc_index, cands, max_combos=5)
    assert small.n_combos <= 5


def test_same_table_combo_single_table_graph(wdc_index):
    cands = [
        type("C", (), {"selected": {ColumnRef("airports_full", "State")}})(),
        type("C", (), {"selected": {ColumnRef("airports_full", "IATA Code")}})(),
    ]
    got = join_graph_search(wdc_index, cands)
    assert got.n_views == 1
    v = got.views[0]
    assert v.graph.tables == frozenset({"airports_full"})
    assert v.graph.edges == frozenset()
