"""End-to-end Ver pipeline (paper Algorithm 1, automatic mode).

query → COLUMN-SELECTION → JOIN-GRAPH-SEARCH → MATERIALIZER →
VIEW-DISTILLATION (→ ranking / VIEW-PRESENTATION handled by callers).
Timings per stage are recorded to reproduce the paper's runtime
breakdown (CS / JGS / M / VD split, Fig 4b).
"""
from __future__ import annotations

import time
from dataclasses import dataclass, field

from pyspark.sql import SparkSession

from repro.core.column_selection import ColumnCandidates, candidates_for_query
from repro.core.distillation import DistillationResult, distill
from repro.core.join_graph_search import SearchResult, join_graph_search
from repro.core.materializer import MaterializedView, materialize_views
from repro.core.qbe import ColumnRef, ExampleQuery, GroundTruthQuery
from repro.corpus.collection import TableCollection
from repro.discovery.index import DiscoveryIndex


@dataclass
class PipelineResult:
    candidates: list[ColumnCandidates]
    search: SearchResult
    views: list[MaterializedView]
    distillation: DistillationResult | None
    timings: dict[str, float] = field(default_factory=dict)
    materialized: bool = True

    @property
    def n_views(self) -> int:
        return len(self.views) if self.materialized else self.search.n_views

    @property
    def view_specs(self) -> list:
        """Specs of the candidate views — materialized ones when the
        MATERIALIZER ran (empty joins dropped), else the enumerated
        specs (the hit-ratio sweep skips materialization for speed)."""
        if self.materialized:
            return [v.spec for v in self.views]
        return list(self.search.views)


def run_pipeline(collection: TableCollection, index: DiscoveryIndex,
                 query: ExampleQuery, *,
                 spark: SparkSession | None = None,
                 strategy: str = "column_selection",
                 engine: str = "pandas",
                 run_distillation: bool = False,
                 theta: int = 1,
                 k: int | None = None,
                 key_threshold: float = 1.0,
                 max_combos: int = 20000,
                 materialize: bool = True) -> PipelineResult:
    """Run Algorithm 1's technical stages for one query.

    ``strategy`` selects COLUMN-SELECTION or one of the RQ3 baselines;
    ``run_distillation`` additionally runs 4C (requires ``spark``);
    ``materialize=False`` stops after enumeration (enough for the
    ground-truth-hit metric, which is decided on view specs).
    """
    timings: dict[str, float] = {}
    t0 = time.perf_counter()
    kwargs = {"theta": theta} if strategy == "column_selection" else {}
    candidates = candidates_for_query(index, query, strategy=strategy,
                                      **kwargs)
    timings["column_selection"] = time.perf_counter() - t0

    t0 = time.perf_counter()
    search = join_graph_search(index, candidates, k=k, max_combos=max_combos)
    timings["join_graph_search"] = time.perf_counter() - t0

    views: list[MaterializedView] = []
    if materialize:
        t0 = time.perf_counter()
        views = materialize_views(collection, search.views, spark=spark,
                                  engine=engine)
        timings["materializer"] = time.perf_counter() - t0

    dist = None
    if run_distillation:
        if spark is None:
            raise ValueError("distillation requires a SparkSession")
        if not materialize:
            raise ValueError("distillation requires materialized views")
        t0 = time.perf_counter()
        dist = distill(spark, views, key_threshold=key_threshold)
        timings["distillation"] = time.perf_counter() - t0
    return PipelineResult(candidates, search, views, dist, timings,
                          materialized=materialize)


def ground_truth_hit(result: PipelineResult, gt: GroundTruthQuery) -> bool:
    """Did the candidate set include the ground-truth view?

    A hit requires some enumerated view to project exactly the
    ground-truth source columns (for 2-column queries) over the
    ground-truth tables — i.e., the system recovered the true PJ-view,
    not merely some view containing the example values.
    """
    gt_proj = tuple(gt.gt_columns)
    for spec in result.view_specs:
        if spec.project_all:
            if spec.projection[0].table in gt.gt_tables:
                return True
            continue
        if spec.projection == gt_proj and gt.gt_tables <= (
                spec.graph.tables | {c.table for c in spec.projection}):
            return True
    return False


def gt_view_id(result: PipelineResult, gt: GroundTruthQuery) -> int | None:
    """View id of the ground-truth view in the result set, if present."""
    gt_proj = tuple(gt.gt_columns)
    for v in result.views:
        spec = v.spec
        if spec.project_all:
            if spec.projection[0].table == next(iter(sorted(gt.gt_tables))):
                return v.view_id
            continue
        if spec.projection == gt_proj and spec.graph.tables == gt.gt_tables:
            return v.view_id
    # Fall back to projection match alone (single-table ground truths
    # reached through an equivalent join graph).
    for v in result.views:
        if not v.spec.project_all and v.spec.projection == gt_proj:
            return v.view_id
    return None
