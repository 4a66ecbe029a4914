"""VIEW-DISTILLATION — the 4C component (paper Section V, Algorithm 3).

Pipeline per schema block (views are only ever compared within a block):

1. **Hash** all views in one Spark pass (``hashing``), derive sizes and
   pairwise intersections from a single self-join.
2. **Compatible / Contained** from the hash sets: equal sets ≡, strict
   subset ⊂. The distillation strategy deduplicates compatible groups
   (keep one representative) and keeps the largest contained view, using
   transitivity to avoid re-comparisons exactly as the paper does (the
   pruned view's representative stands in for it).
3. **Candidate keys** per view (``keys``); for every key column shared
   by ≥2 views, build the inverted index ``key value → (view, row
   hash)`` and group duplicate rows: views in different groups for the
   same key value are **contradictory**; overlapping same-key pairs with
   no contradiction are **complementary**.
4. Complementary unions and contradiction-driven pruning are *strategies*
   evaluated under best/worst key choice and best/worst contradiction
   side (Table IV's C3 columns; Fig 2's step-wise pruning).
"""
from __future__ import annotations

from dataclasses import dataclass, field

from pyspark.sql import SparkSession
from pyspark.sql import functions as F

from repro.core.hashing import (
    VIEW_ID,
    block_frame,
    hash_sets,
    pairwise_intersections,
    with_row_hash,
)
from repro.core.keys import candidate_keys
from repro.core.materializer import MaterializedView
from repro.discovery.graph import union_find_components

Pair = frozenset  # frozenset({view_a, view_b})


@dataclass
class Contradiction:
    """One contradictory signal: a key value whose rows disagree.
    ``groups`` partitions the views carrying that key value by the row
    they report (views in one group agree with each other)."""

    key: str
    value: str
    groups: list[frozenset[int]]

    @property
    def views(self) -> frozenset[int]:
        return frozenset(v for g in self.groups for v in g)

    @property
    def discrimination(self) -> int:
        """# views that agree with one (the largest) side — the sort key
        for presenting the most discriminative contradictions first."""
        return max(len(g) for g in self.groups)


@dataclass
class DistillationResult:
    """4C graph + staged Table IV counts for one candidate view set."""

    n_original: int
    blocks: list[list[int]]
    compatible_pairs: set[Pair] = field(default_factory=set)
    contained_pairs: dict[Pair, int] = field(default_factory=dict)  # -> larger
    complementary_by_key: dict[str, set[Pair]] = field(default_factory=dict)
    contradictory_by_key: dict[str, set[Pair]] = field(default_factory=dict)
    contradictions: list[Contradiction] = field(default_factory=list)
    keys: dict[int, list[str]] = field(default_factory=dict)
    survivors_c1: list[int] = field(default_factory=list)
    survivors_c2: list[int] = field(default_factory=list)
    representatives: dict[int, int] = field(default_factory=dict)
    c3_worst: int = 0
    c3_best: int = 0

    @property
    def after_c1(self) -> int:
        return len(self.survivors_c1)

    @property
    def after_c2(self) -> int:
        return len(self.survivors_c2)

    def edge_label(self, a: int, b: int) -> str | None:
        """Resolved 4C label of a view pair, for the presentation layer.
        Contradictory (under any key) overrides complementary, as in
        Algorithm 3's second phase."""
        p = Pair({a, b})
        if p in self.compatible_pairs:
            return "compatible"
        if p in self.contained_pairs:
            return "contained"
        if any(p in s for s in self.contradictory_by_key.values()):
            return "contradictory"
        if any(p in s for s in self.complementary_by_key.values()):
            return "complementary"
        return None

    def reduction_ratio(self) -> float:
        """Fraction of views pruned by C1+C2 (paper: 'median reduction
        ratio of more than 18%' over OpenData queries)."""
        if self.n_original == 0:
            return 0.0
        return 1.0 - self.after_c2 / self.n_original


def _prune_contained(survivors: list[int],
                     contained: dict[Pair, int]) -> list[int]:
    """Keep the largest view of every containment chain (transitive)."""
    alive = set(survivors)
    changed = True
    while changed:
        changed = False
        for pair, larger in contained.items():
            smaller = next(iter(pair - {larger}))
            if smaller in alive and larger in alive:
                alive.discard(smaller)
                changed = True
    return sorted(alive)


def _c3_counts(block_survivors: list[int],
               complementary_by_key: dict[str, set[Pair]]) -> tuple[int, int]:
    """(worst, best) view counts after unioning complementary views in
    one block, over all candidate-key choices. No valid key → no union."""
    alive = set(block_survivors)
    n = len(alive)
    counts = []
    for key, pairs in complementary_by_key.items():
        edges = [tuple(p) for p in pairs
                 if p <= alive]
        nodes = {v for e in edges for v in e}
        if not nodes:
            continue
        comps = union_find_components(nodes, edges)
        reduction = sum(len(c) - 1 for c in comps)
        counts.append(n - reduction)
    if not counts:
        return n, n
    return max(counts), min(counts)


def contradiction_pruning_steps(result: DistillationResult,
                                max_steps: int = 10
                                ) -> tuple[list[int], list[int]]:
    """Fig 2 simulation: #views remaining after each contradiction-driven
    pruning step, best case (user's side choice prunes most) and worst
    case (prunes least). Contradictions are presented most-discriminative
    first; fully-resolved signals are skipped."""
    out = []
    for best in (True, False):
        alive = set(result.survivors_c2)
        series = []
        pending = sorted(result.contradictions,
                         key=lambda c: -c.discrimination)
        for c in pending:
            if len(series) >= max_steps:
                break
            groups = [g & alive for g in c.groups]
            groups = [g for g in groups if g]
            if len(groups) < 2:
                continue
            keep = min(groups, key=len) if best else max(groups, key=len)
            for g in groups:
                if g is not keep:
                    alive -= g
            series.append(len(alive))
        out.append(series)
    best_series, worst_series = out
    return worst_series, best_series


def distill(spark: SparkSession, views: list[MaterializedView],
            key_threshold: float = 1.0) -> DistillationResult:
    """Run Algorithm 3 over a candidate view set."""
    result = DistillationResult(n_original=len(views), blocks=[])
    if not views:
        return result

    # SCHEMA-BASED-BLOCKS (Alg. 3 line 2).
    blocks: dict[tuple[str, ...], list[MaterializedView]] = {}
    for v in views:
        blocks.setdefault(v.schema_key, []).append(v)

    for _schema, block_views in sorted(blocks.items()):
        ids = [v.view_id for v in block_views]
        result.blocks.append(ids)
        frame = block_frame(spark, block_views).cache()
        hashes = hash_sets(frame).cache()
        sizes = {int(r[VIEW_ID]): r["n"] for r in
                 hashes.groupBy(VIEW_ID).agg(F.count("*").alias("n")).collect()}
        inters = {
            (int(r["view_a"]), int(r["view_b"])): r["overlap"]
            for r in pairwise_intersections(hashes).collect()
        }

        compat, contained, overlapping = set(), {}, set()
        for (a, b), o in inters.items():
            sa, sb = sizes[a], sizes[b]
            if o == sa == sb:
                compat.add(Pair({a, b}))
            elif o == min(sa, sb):
                contained[Pair({a, b})] = a if sa > sb else b
            else:
                overlapping.add(Pair({a, b}))
        result.compatible_pairs |= compat
        result.contained_pairs.update(contained)

        # Candidate keys + inverted index per shared key column.
        keys = candidate_keys(frame, threshold=key_threshold)
        result.keys.update(keys)
        key_cols = sorted({k for ks in keys.values() for k in ks
                           if sum(k in keys[v] for v in ids) >= 2})
        hashed = with_row_hash(frame)
        for k in key_cols:
            with_key = [v for v in ids if k in keys[v]]
            kv = (
                hashed.where(F.col(VIEW_ID).isin(with_key))
                .select(VIEW_ID, F.col(k).alias("__key__"),
                        F.col("__row_hash__"))
                .collect()
            )
            by_value: dict[str, dict[int, set[int]]] = {}
            for r in kv:
                by_value.setdefault(r["__key__"], {}).setdefault(
                    int(r["__row_hash__"]), set()).add(int(r[VIEW_ID]))
            contradictory: set[Pair] = set()
            for value, groups in by_value.items():
                if len(groups) < 2:
                    continue
                flat = [frozenset(g) for g in groups.values()]
                result.contradictions.append(
                    Contradiction(key=k, value=value, groups=flat))
                for i, gi in enumerate(flat):
                    for gj in flat[i + 1:]:
                        for va in gi:
                            for vb in gj:
                                if va != vb:
                                    contradictory.add(Pair({va, vb}))
            complementary = {
                p for p in overlapping
                if all(k in keys[v] for v in p) and p not in contradictory
            }
            if contradictory:
                result.contradictory_by_key.setdefault(k, set()).update(
                    contradictory)
            if complementary:
                result.complementary_by_key.setdefault(k, set()).update(
                    complementary)
        frame.unpersist()
        hashes.unpersist()

    # Distillation strategy: C1 dedupe then C2 keep-largest (Alg. 3 merges
    # this with graph construction; we stage it to report Table IV).
    comp_groups = union_find_components(
        [v.view_id for v in views], [tuple(p) for p in result.compatible_pairs]
    )
    survivors_c1 = []
    for grp in comp_groups:
        rep = min(grp)
        survivors_c1.append(rep)
        for v in grp:
            result.representatives[v] = rep
    result.survivors_c1 = sorted(survivors_c1)
    result.survivors_c2 = _prune_contained(result.survivors_c1,
                                           result.contained_pairs)

    # C3 (complementary union) best/worst key choice, per block, summed.
    alive = set(result.survivors_c2)
    worst_total, best_total = 0, 0
    for ids in result.blocks:
        block_alive = sorted(alive & set(ids))
        comp_by_key = {
            k: {p for p in pairs if p <= set(block_alive)}
            for k, pairs in result.complementary_by_key.items()
        }
        comp_by_key = {k: p for k, p in comp_by_key.items() if p}
        w, b = _c3_counts(block_alive, comp_by_key)
        worst_total += w
        best_total += b
    result.c3_worst = worst_total
    result.c3_best = best_total
    return result
