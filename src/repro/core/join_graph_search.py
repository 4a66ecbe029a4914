"""JOIN-GRAPH-SEARCH (paper Algorithm 5 + Appendix C).

Step 1 (*Join Graph Enumeration*) combines the candidate columns of the
query attributes (one per attribute), asks the discovery engine for all
join graphs connecting their source tables within ρ=2 hops, and caches
non-joinable table pairs so later combos containing them are skipped.

Step 2 (*Ranking and Materialization*) ranks join graphs by the engine's
join score (smaller graphs first, then PK/FK-approximation quality) and
hands the top-k to the MATERIALIZER. The paper's evaluation sets k to
"all" — so does our default.
"""
from __future__ import annotations

import itertools
from dataclasses import dataclass, field

from repro.core.column_selection import ColumnCandidates
from repro.core.qbe import ColumnRef
from repro.discovery.graph import union_find_components
from repro.discovery.index import DiscoveryIndex, JoinGraph


@dataclass(frozen=True)
class ViewSpec:
    """One candidate PJ-view before materialization: a join graph plus
    the projection (the combo columns, in query-attribute order).

    ``project_all`` marks 1-column (user-study style) queries where the
    view is the whole source table — the user inspects the other
    attributes to decide relevance.
    """

    graph: JoinGraph
    projection: tuple[ColumnRef, ...]
    project_all: bool = False

    @property
    def schema_key(self) -> tuple[str, ...]:
        """Attribute names of the projected output — the SCHEMA-BASED-BLOCKS
        key used by VIEW-DISTILLATION."""
        return tuple(c.column for c in self.projection)


@dataclass
class SearchResult:
    """Enumerated candidate views plus the search-space statistics the
    RQ3 figures report (#joinable groups / #join graphs / #views)."""

    views: list[ViewSpec]
    n_joinable_groups: int
    n_join_graphs: int
    n_combos: int
    n_pruned_combos: int = 0
    stats: dict = field(default_factory=dict)

    @property
    def n_views(self) -> int:
        return len(self.views)


def join_graph_search(index: DiscoveryIndex,
                      candidates: list[ColumnCandidates],
                      k: int | None = None,
                      rho: int = 2,
                      max_combos: int = 20000,
                      max_graphs_per_combo: int = 4) -> SearchResult:
    """Algorithm 5 over per-attribute candidate columns."""
    per_col = [sorted(c.selected) for c in candidates]
    if any(not cols for cols in per_col):
        return SearchResult([], 0, 0, 0)

    # Joinable groups: connected components of candidate tables under
    # direct inclusion-dependency edges (reported in Figs 5/6).
    cand_tables = sorted({c.table for cols in per_col for c in cols})
    table_edges = [
        (t1, t2)
        for i, t1 in enumerate(cand_tables)
        for t2 in cand_tables[i + 1:]
        if index.joinable(t1, t2)
    ]
    groups = union_find_components(cand_tables, table_edges)

    non_joinable: set[frozenset[str]] = set()
    views: list[ViewSpec] = []
    seen: set = set()
    n_graphs = 0
    n_combos = 0
    n_pruned = 0
    single_column = len(per_col) == 1

    for combo in itertools.islice(itertools.product(*per_col), max_combos):
        n_combos += 1
        tables = sorted({c.table for c in combo})
        # Non-joinable cache (Alg. 5 lines 6-8): any cached bad pair
        # disqualifies the combo without calling the engine.
        if any(frozenset(p) in non_joinable
               for p in itertools.combinations(tables, 2)):
            n_pruned += 1
            continue
        graphs = index.generate_join_graphs(tables, rho=rho,
                                            max_graphs=max_graphs_per_combo)
        if not graphs:
            if len(tables) == 2:
                non_joinable.add(frozenset(tables))
            n_pruned += 1
            continue
        for g in graphs:
            n_graphs += 1
            spec = ViewSpec(g, tuple(combo), project_all=single_column)
            # Single-column views project the whole table, so two matched
            # columns of one table yield the same view.
            key = ((g.tables, g.edges, spec.projection[0].table)
                   if single_column else (g.tables, g.edges, spec.projection))
            if key not in seen:
                seen.add(key)
                views.append(spec)

    views.sort(key=lambda v: (v.graph.score(index.profiles),
                              sorted(v.graph.tables),
                              v.projection))
    if k is not None:
        views = views[:k]
    return SearchResult(
        views=views,
        n_joinable_groups=len(groups),
        n_join_graphs=n_graphs,
        n_combos=n_combos,
        n_pruned_combos=n_pruned,
    )
