"""Row hashing + pairwise intersections (Algorithm 3, phase 1)."""
import pandas as pd
import pytest

from repro.core.hashing import (
    ROW_HASH,
    VIEW_ID,
    block_frame,
    hash_sets,
    pairwise_intersections,
    with_row_hash,
)
from repro.core.join_graph_search import ViewSpec
from repro.core.materializer import MaterializedView
from repro.core.qbe import ColumnRef
from repro.discovery.index import JoinGraph


def _mv(view_id, df):
    cols = tuple(df.columns)
    spec = ViewSpec(JoinGraph(frozenset({"t"}), frozenset()),
                    tuple(ColumnRef("t", c) for c in cols))
    return MaterializedView(view_id, spec, df.reset_index(drop=True))


@pytest.fixture(scope="module")
def views():
    a = _mv(0, pd.DataFrame({"k": ["1", "2", "3"], "v": ["a", "b", "c"]}))
    b = _mv(1, pd.DataFrame({"k": ["1", "2"], "v": ["a", "b"]}))       # ⊂ a
    c = _mv(2, pd.DataFrame({"k": ["3", "1", "2"], "v": ["c", "a", "b"]}))  # ≡ a
    d = _mv(3, pd.DataFrame({"k": ["9"], "v": ["z"]}))                 # disjoint
    return [a, b, c, d]


def test_block_frame_shape(spark, views):
    frame = block_frame(spark, views)
    assert frame.columns == [VIEW_ID, "k", "v"]
    assert frame.count() == 3 + 2 + 3 + 1


def test_block_frame_rejects_mixed_schemas(spark, views):
    other = _mv(9, pd.DataFrame({"x": ["1"]}))
    with pytest.raises(ValueError, match="single schema"):
        block_frame(spark, views + [other])


def test_hash_sets_sizes(spark, views):
    hs = hash_sets(block_frame(spark, views))
    sizes = dict(
        (r[VIEW_ID], r["n"])
        for r in hs.groupBy(VIEW_ID).count()
        .withColumnRenamed("count", "n").collect()
    )
    assert sizes == {0: 3, 1: 2, 2: 3, 3: 1}


def test_equal_rows_hash_equal(spark, views):
    hs = hash_sets(block_frame(spark, views)).collect()
    by_view = {}
    for r in hs:
        by_view.setdefault(r[VIEW_ID], set()).add(r[ROW_HASH])
    assert by_view[0] == by_view[2]       # compatible views, same hash set
    assert by_view[1] < by_view[0]        # contained
    assert not (by_view[3] & by_view[0])  # disjoint


def test_pairwise_intersections(spark, views):
    hs = hash_sets(block_frame(spark, views))
    inter = {(r["view_a"], r["view_b"]): r["overlap"]
             for r in pairwise_intersections(hs).collect()}
    assert inter[(0, 1)] == 2
    assert inter[(0, 2)] == 3
    assert inter[(1, 2)] == 2
    assert (0, 3) not in inter  # zero-overlap pairs absent
    # canonical ordering view_a < view_b
    assert all(a < b for a, b in inter)


def test_with_row_hash_dedups_value_order(spark):
    # hash is over concatenated row values, order-sensitive by column --
    # same columns, same values => same hash across views.
    f1 = block_frame(spark, [_mv(0, pd.DataFrame({"a": ["x"], "b": ["y"]}))])
    f2 = block_frame(spark, [_mv(1, pd.DataFrame({"a": ["x"], "b": ["y"]}))])
    h1 = with_row_hash(f1).collect()[0][ROW_HASH]
    h2 = with_row_hash(f2).collect()[0][ROW_HASH]
    assert h1 == h2
