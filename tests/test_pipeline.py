"""End-to-end pipeline (Algorithm 1) on both corpora: ground-truth hits
per noise level (Table V shapes), Ver-vs-SELECT-ALL view counts (Table II
shape), distillation monotonicity (Table IV shape)."""
import pytest

from repro.core.pipeline import ground_truth_hit, gt_view_id, run_pipeline
from repro.core.qbe import ExampleQuery, attribute_specification
from repro.corpus import NoiseLevel, noisy_query


@pytest.mark.parametrize("qi", range(5))
def test_wdc_zero_noise_all_strategies_hit(wdc, wdc_index, qi):
    col, queries = wdc
    gt = queries[qi]
    q = noisy_query(col, gt, NoiseLevel.ZERO, seed=0)
    for strategy in ("select_all", "select_best", "column_selection"):
        r = run_pipeline(col, wdc_index, q, strategy=strategy)
        assert ground_truth_hit(r, gt), (gt.name, strategy)


@pytest.mark.parametrize("qi", range(5))
@pytest.mark.parametrize("level", [NoiseLevel.MEDIUM, NoiseLevel.HIGH])
def test_wdc_column_selection_robust_to_noise(wdc, wdc_index, qi, level):
    col, queries = wdc
    gt = queries[qi]
    hits = sum(
        ground_truth_hit(
            run_pipeline(col, wdc_index, noisy_query(col, gt, level, seed=s),
                         strategy="column_selection"), gt)
        for s in range(3)
    )
    assert hits >= 2, (gt.name, level)


@pytest.mark.parametrize("qi", range(5))
def test_wdc_select_all_always_hits(wdc, wdc_index, qi):
    col, queries = wdc
    gt = queries[qi]
    q = noisy_query(col, gt, NoiseLevel.HIGH, seed=1)
    r = run_pipeline(col, wdc_index, q, strategy="select_all")
    assert ground_truth_hit(r, gt)


def test_wdc_select_best_crumbles_under_high_noise(wdc, wdc_index):
    col, queries = wdc
    hits = total = 0
    for gt in queries:
        for s in range(3):
            q = noisy_query(col, gt, NoiseLevel.HIGH, seed=s)
            r = run_pipeline(col, wdc_index, q, strategy="select_best")
            hits += ground_truth_hit(r, gt)
            total += 1
    assert hits / total < 0.25  # paper: 0.02


def test_ver_produces_fewer_views_than_select_all(wdc, wdc_index):
    col, queries = wdc
    q = ExampleQuery.of(["Indiana", "Georgia", "Virginia", "Illinois",
                         "Connecticut"])
    ver = run_pipeline(col, wdc_index, q, strategy="column_selection")
    ftk = run_pipeline(col, wdc_index, q, strategy="select_all")
    assert ver.n_views < ftk.n_views
    assert ground_truth_hit(ver, queries[0])


@pytest.mark.parametrize("corpus_name,qi", [
    ("chembl", 0), ("chembl", 3), ("wdc", 1), ("wdc", 2),
])
def test_distillation_monotone_reduction(request, spark, corpus_name, qi):
    col, queries = request.getfixturevalue(corpus_name)
    idx = request.getfixturevalue(f"{corpus_name}_index")
    gt = queries[qi]
    q = noisy_query(col, gt, NoiseLevel.ZERO, seed=0)
    r = run_pipeline(col, idx, q, spark=spark, run_distillation=True)
    d = r.distillation
    assert r.n_views >= d.after_c1 >= d.after_c2 >= d.c3_worst >= d.c3_best


def test_chembl_q1_has_compatible_views(spark, chembl, chembl_index):
    # The 1-to-1 cell_name/cell_description pair duplicates every assay
    # join -> compatible views (paper's C1 insight).
    col, queries = chembl
    q = noisy_query(col, queries[0], NoiseLevel.ZERO, seed=0)
    r = run_pipeline(col, chembl_index, q, spark=spark, run_distillation=True)
    assert r.distillation.compatible_pairs
    assert r.distillation.after_c1 < r.n_views


def test_chembl_q4_has_contradictions(spark, chembl, chembl_index):
    # Wrong join path (description = pref_name) contradicts the correct
    # 2-hop id path (paper's C4 insight).
    col, queries = chembl
    q = noisy_query(col, queries[3], NoiseLevel.ZERO, seed=0)
    r = run_pipeline(col, chembl_index, q, spark=spark, run_distillation=True)
    assert r.distillation.contradictions


def test_wdc_q3_contradictions_and_best_key_gap(spark, wdc, wdc_index):
    col, queries = wdc
    q = noisy_query(col, queries[2], NoiseLevel.ZERO, seed=0)
    r = run_pipeline(col, wdc_index, q, spark=spark, run_distillation=True)
    d = r.distillation
    assert d.contradictions
    assert d.c3_best < d.c3_worst  # key choice matters (Table IV)


def test_wdc_q2_complementary_unions(spark, wdc, wdc_index):
    col, queries = wdc
    q = noisy_query(col, queries[1], NoiseLevel.ZERO, seed=0)
    r = run_pipeline(col, wdc_index, q, spark=spark, run_distillation=True)
    d = r.distillation
    assert d.complementary_by_key
    assert d.c3_best < d.after_c2


def test_timings_recorded(wdc, wdc_index):
    col, queries = wdc
    q = noisy_query(col, queries[0], NoiseLevel.ZERO, seed=0)
    r = run_pipeline(col, wdc_index, q)
    assert {"column_selection", "join_graph_search",
            "materializer"} <= set(r.timings)
    assert all(t >= 0 for t in r.timings.values())


def test_distillation_requires_spark(wdc, wdc_index):
    col, queries = wdc
    q = noisy_query(col, queries[0], NoiseLevel.ZERO, seed=0)
    with pytest.raises(ValueError, match="SparkSession"):
        run_pipeline(col, wdc_index, q, run_distillation=True)


def test_gt_view_id_found(wdc, wdc_index):
    col, queries = wdc
    gt = queries[0]
    q = noisy_query(col, gt, NoiseLevel.ZERO, seed=0)
    r = run_pipeline(col, wdc_index, q)
    vid = gt_view_id(r, gt)
    assert vid is not None
    view = next(v for v in r.views if v.view_id == vid)
    assert view.spec.projection == tuple(gt.gt_columns)


def test_attribute_specification_pipeline(wdc, wdc_index):
    col, _ = wdc
    q = attribute_specification(["State", "IATA Code"])
    from repro.core.column_selection import candidates_for_query
    from repro.core.join_graph_search import join_graph_search

    cands = candidates_for_query(wdc_index, q, strategy="column_selection",
                                 target="attributes", theta=100)
    search = join_graph_search(wdc_index, cands)
    assert search.n_views > 0
    # Some view should pair the two requested attributes from one table.
    assert any(v.schema_key == ("State", "IATA Code") for v in search.views)


def test_keyword_specification_pipeline(wdc, wdc_index):
    from repro.core.column_selection import candidates_for_query
    from repro.core.join_graph_search import join_graph_search
    from repro.core.qbe import keyword_specification

    q = keyword_specification(["Georgia", "Indiana"])
    cands = candidates_for_query(wdc_index, q)
    search = join_graph_search(wdc_index, cands)
    assert search.n_views > 0
    assert all(v.project_all for v in search.views)
