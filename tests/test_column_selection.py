"""COLUMN-SELECTION (Algorithm 4) and the SELECT-ALL / SELECT-BEST
baselines (RQ3)."""
import pytest

from repro.core.column_selection import (
    STRATEGIES,
    candidates_for_query,
    column_selection,
    select_all,
    select_best,
)
from repro.core.qbe import ColumnRef, ExampleQuery
from repro.corpus import NoiseLevel, noisy_query


def test_strategies_registry():
    assert set(STRATEGIES) == {"column_selection", "select_all",
                               "select_best"}


def test_empty_examples_yield_empty(wdc_index):
    got = column_selection(wdc_index, ("value-that-does-not-exist",))
    assert got.selected == set()
    assert got.clusters == []


def test_select_all_includes_any_overlap(wdc_index):
    got = select_all(wdc_index, ("Georgia",))
    # Every column mentioning Georgia: airports, churches, directories,
    # many distractors...
    tables = {c.table for c in got.selected}
    assert "airports_full" in tables
    assert any(t.startswith("web_") for t in tables)
    assert all(v >= 1 for v in got.columns.values())


def test_select_best_keeps_only_max_overlap(wdc_index):
    got = select_best(wdc_index, ("Georgia", "Indiana", "Virginia"))
    assert got.selected
    best = max(got.columns.values())
    assert best == 3
    assert all(v == best for v in got.columns.values())


def test_column_selection_subsets_select_all(wdc_index):
    ex = ("Georgia", "Indiana", "Virginia")
    cs = column_selection(wdc_index, ex)
    sa = select_all(wdc_index, ex)
    assert cs.selected <= sa.selected
    assert len(cs.selected) < len(sa.selected)


def test_column_selection_prunes_low_overlap_distractors(wdc_index):
    cs = column_selection(wdc_index, ("Georgia", "Indiana", "Virginia"))
    tables = {c.table for c in cs.selected}
    assert "airports_full" in tables
    assert not any(t.startswith("web_") for t in tables)


def test_clusters_are_partition(wdc_index):
    cs = column_selection(wdc_index, ("Georgia", "Indiana"))
    seen = set()
    for cl in cs.clusters:
        assert not (cl & seen)
        seen |= cl
    assert set().union(*cs.clusters) == seen
    for cl in cs.selected_clusters:
        assert cl in cs.clusters


def test_theta_widens_selection(wdc_index):
    ex = ("Georgia", "Indiana", "Virginia")
    narrow = column_selection(wdc_index, ex, theta=1)
    wide = column_selection(wdc_index, ex, theta=10)
    assert narrow.selected <= wide.selected
    assert len(wide.selected) > len(narrow.selected)


def test_candidates_for_query_runs_per_column(wdc_index):
    q = ExampleQuery.of(["Georgia", "Indiana"], ["China", "Japan"])
    got = candidates_for_query(wdc_index, q)
    assert len(got) == 2
    assert any(c.table == "country_population" for c in got[1].selected)


@pytest.mark.parametrize("level", list(NoiseLevel))
def test_cs_keeps_ground_truth_column_under_noise(wdc, wdc_index, level):
    col, queries = wdc
    gt = queries[0]  # airports
    q = noisy_query(col, gt, level, seed=0)
    for examples, ref in zip(q.columns, gt.gt_columns):
        got = column_selection(wdc_index, tuple(examples))
        assert ref in got.selected, level


def test_select_best_loses_ground_truth_under_high_noise(wdc, wdc_index):
    col, queries = wdc
    gt = queries[0]
    misses = 0
    for s in range(5):
        q = noisy_query(col, gt, NoiseLevel.HIGH, seed=s)
        got = select_best(wdc_index, tuple(q.columns[0]))
        misses += gt.gt_columns[0] not in got.selected
    # The SELECT-BEST failure mode of Table V: noise column wins overlap.
    assert misses >= 4


def test_select_best_fine_at_zero_noise(wdc, wdc_index):
    col, queries = wdc
    gt = queries[0]
    q = noisy_query(col, gt, NoiseLevel.ZERO, seed=0)
    got = select_best(wdc_index, tuple(q.columns[0]))
    assert gt.gt_columns[0] in got.selected


def test_noise_column_clusters_with_ground_truth(wdc, wdc_index):
    # Containment >= 0.8 between noise and gt column implies one cluster,
    # which is exactly why COLUMN-SELECTION survives noise (Alg. 4).
    col, queries = wdc
    gt = queries[0]
    cs = column_selection(
        wdc_index, ("Georgia", "Indiana", "Puerto Rico"))
    noise_ref = gt.noise_columns[0]
    gt_ref = gt.gt_columns[0]
    cluster_of = {}
    for i, cl in enumerate(cs.clusters):
        for c in cl:
            cluster_of[c] = i
    assert cluster_of.get(noise_ref) == cluster_of.get(gt_ref)


def test_attribute_target_search(wdc_index):
    got = column_selection(wdc_index, ("State",), target="attributes",
                           theta=100)
    assert ColumnRef("airports_full", "State") in got.selected
