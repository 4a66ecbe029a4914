"""The discovery index and its online API (paper Appendix A).

``build_index`` runs the offline Spark jobs (profiling, value postings,
containment) over a pathless collection and collects the results into a
``DiscoveryIndex`` that serves Aurum's three calls:

* ``SEARCH-KEYWORD(target, fuzzy)``   → ``DiscoveryIndex.search_keyword``
* ``NEIGHBORS(threshold)``            → ``DiscoveryIndex.neighbors``
* ``GENERATE-JOIN-GRAPHS(tables, ρ)`` → ``DiscoveryIndex.generate_join_graphs``

The collected index mirrors Aurum's architecture: the heavy lifting is a
distributed batch job; query serving happens against in-memory postings.
"""
from __future__ import annotations

from dataclasses import dataclass, field
from functools import lru_cache

from pyspark.sql import SparkSession

from repro.core.qbe import ColumnRef
from repro.corpus.collection import TableCollection
from repro.discovery.containment import joinable_pairs
from repro.discovery.profiler import column_profiles, distinct_values


@dataclass(frozen=True, order=True)
class JoinEdge:
    """An undirected inclusion-dependency edge between two columns,
    stored with canonical endpoint order so edge sets are comparable."""

    a: ColumnRef
    b: ColumnRef
    containment: float = 0.0

    @staticmethod
    def of(a: ColumnRef, b: ColumnRef, containment: float = 0.0) -> "JoinEdge":
        if (b.table, b.column) < (a.table, a.column):
            a, b = b, a
        return JoinEdge(a, b, containment)


@dataclass(frozen=True)
class JoinGraph:
    """A connected set of join edges; a single-table graph has none.

    ``tables`` always lists every table touched (so a one-table graph is
    representable), and identity is (tables, edges) — two graphs joining
    the same tables through different column pairs are distinct.
    """

    tables: frozenset[str]
    edges: frozenset[JoinEdge]

    @property
    def n_edges(self) -> int:
        return len(self.edges)

    def score(self, profiles: dict[ColumnRef, dict]) -> tuple:
        """Discovery-engine join score (Appendix C: smaller graphs first,
        then how well the join columns approximate PK/FK — containment
        strength and join-column uniqueness)."""
        if not self.edges:
            return (0, -1.0, -1.0)
        cont = sum(e.containment for e in self.edges) / len(self.edges)
        uniq = 0.0
        for e in self.edges:
            for c in (e.a, e.b):
                uniq = max(uniq, profiles.get(c, {}).get("distinct_ratio", 0.0))
        return (len(self.edges), -cont, -uniq)


@dataclass
class DiscoveryIndex:
    """Collected discovery index over one pathless collection."""

    collection_name: str
    #: value -> columns containing it
    postings: dict[str, frozenset[ColumnRef]]
    #: attribute (column) name -> columns carrying that name
    attributes: dict[str, frozenset[ColumnRef]]
    #: column -> list of (neighbor column, max containment)
    _neighbors: dict[ColumnRef, list[tuple[ColumnRef, float]]]
    #: column -> {n_rows, n_distinct, distinct_ratio}
    profiles: dict[ColumnRef, dict]
    threshold: float = 0.8
    #: table -> neighbor table -> join edges between them
    table_edges: dict[str, dict[str, list[JoinEdge]]] = field(
        default_factory=dict
    )

    # -- SEARCH-KEYWORD ----------------------------------------------------
    def search_keyword(self, term: str, target: str = "values",
                       fuzzy: int = 0) -> set[ColumnRef]:
        """Columns matching ``term`` in values and/or attribute names.

        ``fuzzy`` is a maximum Levenshtein distance (0 = exact), matching
        Aurum's SEARCH-KEYWORD contract.
        """
        if target not in ("values", "attributes", "all"):
            raise ValueError(f"bad target {target!r}")
        out: set[ColumnRef] = set()
        sources = []
        if target in ("values", "all"):
            sources.append(self.postings)
        if target in ("attributes", "all"):
            sources.append(self.attributes)
        for src in sources:
            if fuzzy <= 0:
                out |= src.get(term, frozenset())
            else:
                for key, cols in src.items():
                    if _levenshtein_at_most(term, key, fuzzy):
                        out |= cols
        return out

    # -- NEIGHBORS ---------------------------------------------------------
    def neighbors(self, col: ColumnRef,
                  threshold: float | None = None
                  ) -> list[tuple[ColumnRef, float]]:
        """Columns with Jaccard containment ≥ threshold w.r.t. ``col``.

        The index is built at ``self.threshold``; asking for a lower one
        raises because those edges were pruned offline (as in Aurum)."""
        threshold = self.threshold if threshold is None else threshold
        if threshold < self.threshold:
            raise ValueError(
                f"index built at threshold {self.threshold}; rebuild to query "
                f"at {threshold}"
            )
        return [(c, s) for c, s in self._neighbors.get(col, [])
                if s >= threshold]

    # -- GENERATE-JOIN-GRAPHS ----------------------------------------------
    def generate_join_graphs(self, tables: list[str], rho: int = 2,
                             max_graphs: int = 64) -> list[JoinGraph]:
        """All join graphs connecting ``tables`` with ≤ ``rho`` hops per
        connection (paper default ρ=2: direct joins plus one intermediate
        table). A single table yields the trivial edgeless graph.

        Queries in the evaluation have ≤ 2 distinct source tables (τ≤2);
        larger sets are connected pairwise through the first table, a
        documented simplification (DESIGN.md §5).
        """
        uniq = sorted(set(tables))
        if len(uniq) == 1:
            return [JoinGraph(frozenset(uniq), frozenset())]
        graphs: list[JoinGraph] = []
        anchor, rest = uniq[0], uniq[1:]
        partial: list[JoinGraph] = [JoinGraph(frozenset({anchor}), frozenset())]
        for target in rest:
            nxt: list[JoinGraph] = []
            for g in partial:
                if target in g.tables:
                    nxt.append(g)
                    continue
                for path in self._paths(anchor, target, rho):
                    nxt.append(JoinGraph(
                        g.tables | frozenset(t for e in path
                                             for t in (e.a.table, e.b.table)),
                        g.edges | frozenset(path),
                    ))
                    if len(nxt) >= max_graphs:
                        break
                if len(nxt) >= max_graphs:
                    break
            partial = nxt
            if not partial:
                return []
        for g in partial:
            if all(t in g.tables for t in uniq):
                graphs.append(g)
        # Deduplicate by (tables, edges); keep deterministic order.
        seen = set()
        out = []
        for g in graphs:
            key = (g.tables, g.edges)
            if key not in seen:
                seen.add(key)
                out.append(g)
        return out[:max_graphs]

    def _paths(self, src: str, dst: str, rho: int) -> list[list[JoinEdge]]:
        """Simple table-level paths src→dst with ≤ rho hops, expanded to
        every concrete column-pair choice per hop."""
        results: list[list[JoinEdge]] = []

        def walk(at: str, seen: tuple[str, ...], edges: list[JoinEdge]):
            if at == dst:
                results.append(list(edges))
                return
            if len(seen) - 1 >= rho:
                return
            for nxt, cols in sorted(self.table_edges.get(at, {}).items()):
                if nxt in seen:
                    continue
                for e in cols:
                    edges.append(e)
                    walk(nxt, seen + (nxt,), edges)
                    edges.pop()

        walk(src, (src,), [])
        # Prefer direct joins, then stronger inclusion dependencies —
        # the same bias as the engine's join score, so downstream caps
        # keep the best graphs.
        results.sort(key=lambda p: (
            len(p), -sum(e.containment for e in p) / len(p)))
        return results

    def joinable(self, t1: str, t2: str) -> bool:
        """Direct inclusion-dependency edge between two tables?"""
        return t2 in self.table_edges.get(t1, {})

    @property
    def n_joinable_pairs(self) -> int:
        """Number of joinable column pairs (Table I '# Joinable Columns'),
        counting intra-table pairs too — each undirected pair once."""
        return sum(len(v) for v in self._neighbors.values()) // 2


@lru_cache(maxsize=4096)
def _levenshtein_at_most(a: str, b: str, d: int) -> bool:
    """Banded Levenshtein check (distance ≤ d), used by fuzzy search."""
    if abs(len(a) - len(b)) > d:
        return False
    prev = list(range(len(b) + 1))
    for i, ca in enumerate(a, 1):
        cur = [i]
        for j, cb in enumerate(b, 1):
            cur.append(min(prev[j] + 1, cur[j - 1] + 1,
                           prev[j - 1] + (ca != cb)))
        if min(cur) > d:
            return False
        prev = cur
    return prev[-1] <= d


def build_index(spark: SparkSession, col: TableCollection,
                threshold: float = 0.8) -> DiscoveryIndex:
    """Offline index build: Spark jobs over the cell relation, collected
    into the serving structures (DESIGN.md §1 'Offline index build')."""
    cells = col.cells(spark)
    profiles_df = column_profiles(cells)
    distinct_df = distinct_values(cells).cache()
    pairs_df = joinable_pairs(distinct_df, profiles_df, threshold=threshold)

    prof_rows = profiles_df.collect()
    profiles = {
        ColumnRef(r["table"], r["column"]): {
            "n_rows": r["n_rows"],
            "n_distinct": r["n_distinct"],
            "distinct_ratio": r["distinct_ratio"],
        }
        for r in prof_rows
    }

    postings: dict[str, set[ColumnRef]] = {}
    for r in distinct_df.collect():
        postings.setdefault(r["value"], set()).add(
            ColumnRef(r["table"], r["column"])
        )

    attributes: dict[str, set[ColumnRef]] = {}
    for t, c in col.columns():
        attributes.setdefault(c, set()).add(ColumnRef(t, c))

    neighbors: dict[ColumnRef, list[tuple[ColumnRef, float]]] = {}
    table_edges: dict[str, dict[str, list[JoinEdge]]] = {}
    for r in pairs_df.collect():
        ca = ColumnRef(r["table_a"], r["column_a"])
        cb = ColumnRef(r["table_b"], r["column_b"])
        cont = float(r["containment"])
        neighbors.setdefault(ca, []).append((cb, cont))
        neighbors.setdefault(cb, []).append((ca, cont))
        if ca.table != cb.table:
            e = JoinEdge.of(ca, cb, cont)
            table_edges.setdefault(ca.table, {}).setdefault(
                cb.table, []).append(e)
            table_edges.setdefault(cb.table, {}).setdefault(
                ca.table, []).append(e)

    distinct_df.unpersist()
    for v in neighbors.values():
        v.sort()
    return DiscoveryIndex(
        collection_name=col.name,
        postings={k: frozenset(v) for k, v in postings.items()},
        attributes={k: frozenset(v) for k, v in attributes.items()},
        _neighbors=neighbors,
        profiles=profiles,
        threshold=threshold,
        table_edges=table_edges,
    )
