"""COLUMN-SELECTION (paper Algorithm 4) and the two baselines of RQ3.

For each query column the component retrieves every column with
non-empty overlap with the example values, clusters the candidates by
connected components over the discovery engine's containment-neighbor
hypergraph, scores each cluster by the *maximum* overlap of any member
column, and keeps the clusters in the top-θ score ranks (θ=1 keeps the
highest-scoring cluster(s), ties included — the paper's default).

Baselines (Section VI, RQ3):

* ``select_all``  — any column containing ≥1 example (FastTopK / S4 [35]);
* ``select_best`` — only the column(s) with the maximum number of
  examples (SQuID's strategy [36]).
"""
from __future__ import annotations

from dataclasses import dataclass

from repro.core.qbe import ColumnRef, ExampleQuery
from repro.discovery.graph import union_find_components
from repro.discovery.index import DiscoveryIndex


@dataclass
class ColumnCandidates:
    """Candidates for one query column: selected columns with overlap
    scores, plus the cluster structure (exposed so the interactive mode
    and the microbenchmarks can inspect it)."""

    columns: dict[ColumnRef, int]
    clusters: list[set[ColumnRef]]
    selected_clusters: list[set[ColumnRef]]

    @property
    def selected(self) -> set[ColumnRef]:
        return set(self.columns)


def _overlaps(index: DiscoveryIndex, examples: tuple[str, ...],
              fuzzy: int = 0, target: str = "values"
              ) -> dict[ColumnRef, int]:
    """|col ∩ examples| for every column with non-empty overlap."""
    hits: dict[ColumnRef, int] = {}
    for e in examples:
        for c in index.search_keyword(e, target=target, fuzzy=fuzzy):
            hits[c] = hits.get(c, 0) + 1
    return hits


def column_selection(index: DiscoveryIndex, examples: tuple[str, ...],
                     theta: int = 1, fuzzy: int = 0,
                     target: str = "values") -> ColumnCandidates:
    """Ver's COLUMN-SELECTION (Algorithm 4) for one query column."""
    hits = _overlaps(index, examples, fuzzy=fuzzy, target=target)
    if not hits:
        return ColumnCandidates({}, [], [])
    nodes = list(hits)
    edges = [
        (c, n)
        for c in nodes
        for n, _score in index.neighbors(c)
        if n in hits
    ]
    clusters = union_find_components(nodes, edges)
    scored = sorted(
        ((max(hits[c] for c in cl), sorted(cl)) for cl in clusters),
        key=lambda t: (-t[0], t[1]),
    )
    top_scores = sorted({s for s, _ in scored}, reverse=True)[:theta]
    selected_clusters = [set(cl) for s, cl in scored if s in top_scores]
    columns = {c: hits[c] for cl in selected_clusters for c in cl}
    return ColumnCandidates(columns, [set(cl) for _, cl in scored],
                            selected_clusters)


def select_all(index: DiscoveryIndex, examples: tuple[str, ...],
               fuzzy: int = 0) -> ColumnCandidates:
    """SELECT-ALL baseline: every column containing at least one example."""
    hits = _overlaps(index, examples, fuzzy=fuzzy)
    return ColumnCandidates(hits, [ {c} for c in hits ], [ {c} for c in hits ])


def select_best(index: DiscoveryIndex, examples: tuple[str, ...],
                fuzzy: int = 0) -> ColumnCandidates:
    """SELECT-BEST baseline: the column(s) with maximum example overlap.

    Over-relies on full containment of the (noisy) input — the failure
    mode Table V demonstrates.
    """
    hits = _overlaps(index, examples, fuzzy=fuzzy)
    if not hits:
        return ColumnCandidates({}, [], [])
    best = max(hits.values())
    chosen = {c: v for c, v in hits.items() if v == best}
    return ColumnCandidates(chosen, [ {c} for c in hits ],
                            [ {c} for c in chosen ])


STRATEGIES = {
    "column_selection": column_selection,
    "select_all": select_all,
    "select_best": select_best,
}


def candidates_for_query(index: DiscoveryIndex, query: ExampleQuery,
                         strategy: str = "column_selection",
                         **kwargs) -> list[ColumnCandidates]:
    """Run a selection strategy on every query column (Alg. 1, lines 3-7)."""
    fn = STRATEGIES[strategy]
    return [fn(index, col_examples, **kwargs) for col_examples in query.columns]
