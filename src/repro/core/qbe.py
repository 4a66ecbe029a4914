"""View specification (paper Section III, VIEW-SPECIFICATION).

Ver's default interface is query-by-example (QBE): the user supplies a
small noisy example table (Definition 3). We also implement the two
alternative specification methods evaluated in Section VI-C1 — keyword
search and attribute search — as thin adapters that produce the same
downstream artifact: per-query-column example/value sets.
"""
from __future__ import annotations

from dataclasses import dataclass, field


@dataclass(frozen=True, order=True)
class ColumnRef:
    """A column in the pathless collection, addressed as (table, column)."""

    table: str
    column: str

    def __str__(self) -> str:  # pragma: no cover - repr convenience
        return f"{self.table}.{self.column}"


@dataclass(frozen=True)
class ExampleQuery:
    """A noisy QBE query: ``columns[i]`` holds the example values of the
    i-th query attribute (paper: χ.A_i). Paper workloads use 2 columns ×
    3 rows; the user study uses 1 column × 5 values."""

    columns: tuple[tuple[str, ...], ...]

    @staticmethod
    def of(*cols: list[str] | tuple[str, ...]) -> "ExampleQuery":
        return ExampleQuery(tuple(tuple(c) for c in cols))

    @property
    def n_columns(self) -> int:
        return len(self.columns)


@dataclass
class GroundTruthQuery:
    """A ground-truth PJ-query used to generate noisy workloads (VI-B).

    ``gt_columns[i]`` is the true source column of query attribute i;
    ``noise_columns[i]`` is a column with Jaccard containment ≥ 0.8
    w.r.t. the ground-truth column, from which noisy example values are
    drawn. ``gt_tables``/``gt_join`` identify the ground-truth join graph
    (``gt_join`` empty for single-table ground truths).
    """

    name: str
    gt_columns: list[ColumnRef]
    noise_columns: list[ColumnRef]
    gt_tables: frozenset[str] = field(default_factory=frozenset)
    gt_join: tuple[tuple[ColumnRef, ColumnRef], ...] = ()

    def __post_init__(self) -> None:
        if len(self.gt_columns) != len(self.noise_columns):
            raise ValueError("need one noise column per ground-truth column")
        if not self.gt_tables:
            self.gt_tables = frozenset(c.table for c in self.gt_columns)


def keyword_specification(keywords: list[str]) -> ExampleQuery:
    """Keyword-search specification: one query column holding the keywords.

    Downstream, COLUMN-SELECTION matches keywords against values *and*
    attribute names (the discovery index's SEARCH-KEYWORD covers both).
    """
    return ExampleQuery.of(list(keywords))


def attribute_specification(attributes: list[str]) -> ExampleQuery:
    """Attribute-search specification: one query column per requested
    attribute name; matched against schema, not values."""
    return ExampleQuery.of(*[[a] for a in attributes])
