"""Noisy QBE workload generation (paper Section VI-B).

Each workload query is a 2-column × 3-row example table (the user-study
queries are 1 column × 5 values and are built directly in the jobs).
Three noise levels:

* **Zero**   — all example values sampled from the ground-truth column.
* **Medium** — 2/3 from the ground-truth column, 1/3 from the *noise
  column* (a planted column with Jaccard containment ≥ 0.8 w.r.t. the
  ground truth); noisy values are drawn from the noise column's values
  that do **not** appear in the ground-truth column, otherwise they would
  not be noise.
* **High**   — 1/3 ground truth, 2/3 noise.
"""
from __future__ import annotations

import enum

import numpy as np

from repro.core.qbe import ExampleQuery, GroundTruthQuery
from repro.corpus.collection import TableCollection


class NoiseLevel(enum.Enum):
    ZERO = "zero"
    MEDIUM = "medium"
    HIGH = "high"

    @property
    def n_noise(self) -> int:
        """Noisy values out of 3 examples per query column."""
        return {"zero": 0, "medium": 1, "high": 2}[self.value]


N_EXAMPLES_PER_COLUMN = 3


def _distinct(col: TableCollection, table: str, column: str) -> list[str]:
    vals = col.tables[table][column].dropna().unique().tolist()
    if not vals:
        raise ValueError(f"empty column {table}.{column}")
    return sorted(vals)


def noisy_query(col: TableCollection, gt: GroundTruthQuery,
                level: NoiseLevel, seed: int = 0) -> ExampleQuery:
    """Sample one noisy example query for ``gt`` at ``level``.

    Deterministic in ``(gt.name, level, seed)`` so workloads are
    reproducible across the Spark pipeline and the oracle.
    """
    g = np.random.default_rng(
        abs(hash((gt.name, level.value, seed))) % (2**32)
    )
    cols: list[list[str]] = []
    for gt_ref, noise_ref in zip(gt.gt_columns, gt.noise_columns):
        gt_vals = _distinct(col, gt_ref.table, gt_ref.column)
        noise_vals = _distinct(col, noise_ref.table, noise_ref.column)
        exclusive = sorted(set(noise_vals) - set(gt_vals))
        n_noise = min(level.n_noise, len(exclusive))
        n_gt = N_EXAMPLES_PER_COLUMN - n_noise
        picked = list(g.choice(gt_vals, size=min(n_gt, len(gt_vals)),
                               replace=False))
        if n_noise:
            picked += list(g.choice(exclusive, size=n_noise, replace=False))
        cols.append(picked)
    return ExampleQuery.of(*cols)


def workload(col: TableCollection, gts: list[GroundTruthQuery],
             n_per_level: int = 5) -> list[tuple[GroundTruthQuery, NoiseLevel,
                                                 int, ExampleQuery]]:
    """The Table V workload: ``n_per_level`` noisy queries per ground
    truth per noise level (paper: 5 × 3 levels × gt queries = 150 across
    both corpora)."""
    out = []
    for gt in gts:
        for level in NoiseLevel:
            for s in range(n_per_level):
                out.append((gt, level, s, noisy_query(col, gt, level, seed=s)))
    return out
