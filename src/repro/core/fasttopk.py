"""FASTTOPK baseline (S4 [35]): overlap-score ranking of candidate views.

The user study (RQ1) compares Ver's VIEW-PRESENTATION against a flat
ranking where the view score is its overlap with the input example
values, and the user manually scans the list. Algorithm 1 also uses this
ranking for Ver's non-interactive mode (line 13).
"""
from __future__ import annotations

from repro.core.materializer import MaterializedView
from repro.core.qbe import ExampleQuery


def overlap_score(view: MaterializedView, query: ExampleQuery) -> int:
    """# example values present anywhere in the view."""
    values = set()
    for col in view.df.columns:
        values.update(view.df[col].dropna())
    examples = {e for col in query.columns for e in col}
    return len(examples & values)


def rank_views(views: list[MaterializedView],
               query: ExampleQuery) -> list[MaterializedView]:
    """Overlap-based ranking, ties broken by view size (larger first)
    then id — a deterministic FASTTOPK ordering."""
    return sorted(
        views,
        key=lambda v: (-overlap_score(v, query), -v.n_rows, v.view_id),
    )
