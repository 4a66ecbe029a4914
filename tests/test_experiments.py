"""Experiment drivers (one per evaluation table) at test scale.

Bench-scale shape assertions live in ``benchmarks/``; here we check the
drivers produce well-formed rows and the direction of every effect.
"""
import pytest

from repro.experiments import (
    search_space_stats,
    table1_corpus_stats,
    table2_view_counts,
    table3_user_study,
    table4_distillation,
    table5_hit_ratio,
)


@pytest.fixture(scope="module", autouse=True)
def _warm(wdc_index, chembl_index):
    """Reuse the session-cached test-scale indexes."""


def test_table1_stats(spark):
    rows = table1_corpus_stats(spark, names=("wdc", "chembl"))
    assert [r["dataset"] for r in rows] == ["wdc", "chembl"]
    for r in rows:
        assert r["n_tables"] > 0
        assert r["n_columns"] >= 2 * r["n_tables"] - r["n_tables"]
        assert r["n_joinable_pairs"] > 0
        assert r["n_rows"] > 0
        assert r["size_bytes"] > 0


def test_table1_wdc_vs_chembl_shape(spark):
    rows = {r["dataset"]: r for r in
            table1_corpus_stats(spark, names=("wdc", "chembl"))}
    # Paper Table I: WDC has many more tables than ChEMBL.
    assert rows["wdc"]["n_tables"] > rows["chembl"]["n_tables"]


def test_table2_ver_fewer_views(spark):
    rows = table2_view_counts(spark)
    assert len(rows) == 5
    for r in rows:
        assert 0 < r["ver_views"] < r["fasttopk_views"]


def test_table2_identical_examples_identical_counts(spark):
    rows = {r["query"]: r for r in table2_view_counts(spark)}
    # IATA and churches share the same example values -> same counts
    # (as in the paper's Table II: 397/2255 for both state queries).
    assert (rows["iata_airports"]["ver_views"]
            == rows["churches"]["ver_views"])
    assert (rows["population"]["ver_views"] == rows["births"]["ver_views"])


def test_table3_user_study_wellformed(spark):
    res = table3_user_study(spark, n_users=6)
    assert res["n_users"] == 6
    assert 0 <= res["q1_found_ver"] <= 6
    assert 0 <= res["q1_found_fasttopk"] <= 6
    assert res["q1_found_ver"] >= res["q1_found_fasttopk"] - 1
    assert res["median_interactions_ver"] >= 1
    assert (res["q2_prefer_ver"] + res["q2_prefer_fasttopk"] == 6)


def test_table4_distillation_monotone(spark):
    rows = table4_distillation(spark, min_views=5)
    assert rows
    for r in rows:
        assert (r["original"] >= r["c1"] >= r["c2"]
                >= r["c3_worst"] >= r["c3_best"]), r
        assert len(r["c4_prune_worst"]) <= 10
    assert any(r["n_contradictions"] > 0 for r in rows)


def test_table5_hit_ratio_shape(spark):
    rows, n = table5_hit_ratio(spark, n_per_level=1)
    assert n == 30  # 10 ground truths x 3 levels x 1 sample
    hit = {(r["strategy"], r["noise"]): r["hit_ratio"] for r in rows}
    assert hit[("select_all", "zero")] == 1.0
    assert hit[("select_best", "zero")] == 1.0
    assert hit[("column_selection", "zero")] == 1.0
    assert hit[("select_all", "high")] == 1.0
    assert hit[("select_best", "high")] < hit[("column_selection", "high")]


def test_search_space_stats_select_all_larger(spark):
    rows = search_space_stats(spark)
    by_query = {}
    for r in rows:
        by_query.setdefault(r["query"], {})[r["strategy"]] = r
    for q, d in by_query.items():
        sa, cs = d["select_all"], d["column_selection"]
        assert sa["views"] >= cs["views"], q
        assert sa["join_graphs"] >= cs["join_graphs"], q
