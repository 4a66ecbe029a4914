"""Connected components: driver union-find vs Spark label propagation."""
import random

import pytest

from repro.discovery.graph import spark_components, union_find_components


@pytest.mark.parametrize(
    "nodes,edges,expected",
    [
        ([], [], []),
        ([1], [], [{1}]),
        ([1, 2], [(1, 2)], [{1, 2}]),
        ([1, 2, 3], [(1, 2)], [{1, 2}, {3}]),
        ([1, 2, 3, 4], [(1, 2), (3, 4)], [{1, 2}, {3, 4}]),
        ([1, 2, 3, 4], [(1, 2), (2, 3), (3, 4)], [{1, 2, 3, 4}]),
        # duplicate / self edges
        ([1, 2], [(1, 2), (2, 1), (1, 1)], [{1, 2}]),
    ],
)
def test_union_find(nodes, edges, expected):
    got = union_find_components(nodes, edges)
    assert sorted(map(sorted, got)) == sorted(map(sorted, expected))


def test_union_find_ignores_foreign_edges():
    got = union_find_components([1, 2], [(1, 99), (2, 98), (98, 99)])
    assert sorted(map(sorted, got)) == [[1], [2]]


def test_union_find_hashable_nodes():
    comps = union_find_components(["a", "b", "c"], [("a", "c")])
    assert sorted(map(sorted, comps)) == [["a", "c"], ["b"]]


@pytest.mark.parametrize("seed", [0, 1, 2])
def test_spark_components_match_union_find(spark, seed):
    rng = random.Random(seed)
    n = 30
    nodes = [f"n{i:02d}" for i in range(n)]
    edges = [tuple(rng.sample(nodes, 2)) for _ in range(25)]
    expected = union_find_components(nodes, edges)
    exp_labels = {}
    for comp in expected:
        rep = min(comp)
        for x in comp:
            exp_labels[x] = rep

    nodes_df = spark.createDataFrame([(x,) for x in nodes], ["id"])
    edges_df = spark.createDataFrame(edges, ["src", "dst"])
    got = {r["id"]: r["component"]
           for r in spark_components(nodes_df, edges_df).collect()}
    assert got == exp_labels


def test_spark_components_isolated_nodes(spark):
    nodes_df = spark.createDataFrame([("a",), ("b",)], ["id"])
    edges_df = spark.createDataFrame([], "src string, dst string")
    got = {r["id"]: r["component"]
           for r in spark_components(nodes_df, edges_df).collect()}
    assert got == {"a": "a", "b": "b"}
