"""Approximate candidate-key identification (Definition 7)."""
import pandas as pd
import pytest

from repro.core.hashing import block_frame
from repro.core.keys import candidate_keys
from tests.test_hashing import _mv


def test_exact_keys(spark):
    v = _mv(0, pd.DataFrame({"k": ["1", "2", "3"], "v": ["a", "a", "b"]}))
    frame = block_frame(spark, [v])
    assert candidate_keys(frame, threshold=1.0) == {0: ["k"]}


def test_no_keys(spark):
    v = _mv(0, pd.DataFrame({"k": ["1", "1"], "v": ["a", "a"]}))
    frame = block_frame(spark, [v])
    assert candidate_keys(frame) == {0: []}


def test_both_columns_keys(spark):
    v = _mv(0, pd.DataFrame({"k": ["1", "2"], "v": ["a", "b"]}))
    frame = block_frame(spark, [v])
    assert candidate_keys(frame) == {0: ["k", "v"]}


@pytest.mark.parametrize("threshold,expected", [
    (1.0, []),
    (0.75, ["k"]),
    (0.5, ["k", "v"]),
])
def test_approximate_threshold(spark, threshold, expected):
    v = _mv(0, pd.DataFrame({"k": ["1", "2", "3", "3"],
                             "v": ["a", "a", "b", "b"]}))
    frame = block_frame(spark, [v])
    assert candidate_keys(frame, threshold=threshold) == {0: expected}


def test_per_view_keys_in_one_block(spark):
    a = _mv(0, pd.DataFrame({"k": ["1", "2"], "v": ["a", "a"]}))
    b = _mv(1, pd.DataFrame({"k": ["1", "1"], "v": ["a", "b"]}))
    frame = block_frame(spark, [a, b])
    got = candidate_keys(frame)
    assert got == {0: ["k"], 1: ["v"]}
