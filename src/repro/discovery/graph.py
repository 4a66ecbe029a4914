"""Connected components over the joinable-column hypergraph.

COLUMN-SELECTION (Algorithm 4, line 5) clusters candidate columns by
finding connected components over the discovery engine's neighbor graph.
Two implementations with identical semantics:

* ``union_find_components`` — driver-side union–find for the online path
  (candidate sets are small by construction);
* ``spark_components`` — iterative minimum-label propagation expressed in
  DataFrame operations, for whole-corpus clustering at index-build scale.

Tests assert both produce the same partition.
"""
from __future__ import annotations

from collections.abc import Hashable, Iterable

from pyspark.sql import DataFrame
from pyspark.sql import functions as F


def union_find_components(
    nodes: Iterable[Hashable],
    edges: Iterable[tuple[Hashable, Hashable]],
) -> list[set]:
    """Partition ``nodes`` into connected components under ``edges``.

    Edges whose endpoints are not both in ``nodes`` are ignored (the
    online path restricts the corpus-wide graph to candidate columns).
    """
    parent: dict = {n: n for n in nodes}

    def find(x):
        root = x
        while parent[root] != root:
            root = parent[root]
        while parent[x] != root:  # path compression
            parent[x], x = root, parent[x]
        return root

    for a, b in edges:
        if a in parent and b in parent:
            ra, rb = find(a), find(b)
            if ra != rb:
                parent[ra] = rb

    comps: dict = {}
    for n in parent:
        comps.setdefault(find(n), set()).add(n)
    return list(comps.values())


def spark_components(nodes: DataFrame, edges: DataFrame,
                     max_iter: int = 50) -> DataFrame:
    """Connected components by iterative min-label propagation.

    ``nodes``: one column ``id`` (string). ``edges``: ``src``/``dst``
    (string, undirected). Returns ``(id, component)`` where ``component``
    is the lexicographically smallest member id — a deterministic
    canonical label shared with ``union_find_components`` output.
    """
    sym = edges.select("src", "dst").union(
        edges.select(F.col("dst").alias("src"), F.col("src").alias("dst"))
    )
    labels = nodes.select("id", F.col("id").alias("component"))
    for _ in range(max_iter):
        # Each node adopts the smallest label among itself + neighbors.
        neighbor_labels = (
            sym.join(labels, on=sym.dst == labels.id)
            .select(F.col("src").alias("id"), "component")
        )
        new_labels = (
            labels.unionByName(neighbor_labels)
            .groupBy("id")
            .agg(F.min("component").alias("component"))
        )
        changed = (
            new_labels.alias("n")
            .join(labels.alias("o"), on="id")
            .where(F.col("n.component") != F.col("o.component"))
            .limit(1)
            .count()
        )
        labels = new_labels.localCheckpoint(eager=True)  # cut lineage growth
        if changed == 0:
            break
    return labels
