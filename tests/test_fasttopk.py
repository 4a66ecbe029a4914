"""FASTTOPK overlap ranking baseline."""
import pandas as pd

from repro.core.fasttopk import overlap_score, rank_views
from repro.core.qbe import ExampleQuery
from tests.test_hashing import _mv


def test_overlap_score_counts_distinct_example_hits():
    v = _mv(0, pd.DataFrame({"a": ["x", "y"], "b": ["z", "x"]}))
    q = ExampleQuery.of(["x", "z", "missing"])
    assert overlap_score(v, q) == 2


def test_overlap_score_multi_column_query():
    v = _mv(0, pd.DataFrame({"a": ["x"], "b": ["y"]}))
    q = ExampleQuery.of(["x"], ["y"])
    assert overlap_score(v, q) == 2


def test_rank_by_overlap_then_size():
    big = _mv(0, pd.DataFrame({"a": ["x", "q", "r"]}))
    small = _mv(1, pd.DataFrame({"a": ["x"]}))
    best = _mv(2, pd.DataFrame({"a": ["x", "y"]}))
    q = ExampleQuery.of(["x", "y"])
    ranked = rank_views([big, small, best], q)
    assert [v.view_id for v in ranked] == [2, 0, 1]


def test_rank_deterministic_tiebreak_by_id():
    a = _mv(0, pd.DataFrame({"a": ["x"]}))
    b = _mv(1, pd.DataFrame({"a": ["x"]}))
    q = ExampleQuery.of(["x"])
    assert [v.view_id for v in rank_views([b, a], q)] == [0, 1]
