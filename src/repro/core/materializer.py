"""MATERIALIZER: execute PJ queries for candidate join graphs.

Two engines with identical semantics (asserted against each other and
against the DuckDB oracle in tests):

* ``engine="spark"``  — chain of Spark DataFrame inner joins + projection
  (the "processing engine" upgrade the paper suggests over its pandas
  materializer);
* ``engine="pandas"`` — pandas merges, mirroring the paper's own
  implementation; used for large query sweeps where per-view Spark job
  latency would dominate wall clock (DESIGN.md §5).

Views are materialized under **set semantics** (duplicate rows dropped):
VIEW-DISTILLATION's 4C definitions treat views as row sets.
"""
from __future__ import annotations

from dataclasses import dataclass
from functools import reduce

import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.core.join_graph_search import ViewSpec
from repro.core.qbe import ColumnRef
from repro.corpus.collection import TableCollection

_SEP = "||"


def _qual(table: str, column: str) -> str:
    return f"{table}{_SEP}{column}"


def output_names(spec: ViewSpec, collection: TableCollection) -> list[str]:
    """Deterministic output attribute names for a view.

    Projected columns keep their source column name; colliding names get
    positional suffixes so the output schema is unambiguous. 1-column
    (``project_all``) views expose their table's full schema.
    """
    if spec.project_all:
        return list(collection.tables[spec.projection[0].table].columns)
    names: list[str] = []
    for c in spec.projection:
        name = c.column
        if name in names:
            name = f"{name}__{sum(n.startswith(c.column) for n in names) + 1}"
        names.append(name)
    return names


@dataclass
class MaterializedView:
    """A materialized candidate PJ-view: spec + rows (pandas, collected)."""

    view_id: int
    spec: ViewSpec
    df: pd.DataFrame

    @property
    def schema_key(self) -> tuple[str, ...]:
        return tuple(self.df.columns)

    @property
    def n_rows(self) -> int:
        return len(self.df)


def _join_order(spec: ViewSpec) -> list:
    """BFS edge order so every join connects to the already-built result."""
    tables = sorted(spec.graph.tables)
    if not spec.graph.edges:
        if len(tables) > 1:
            raise ValueError(f"disconnected join graph: {spec.graph}")
        return []
    visited = {tables[0]}
    pending = list(spec.graph.edges)
    ordered = []
    while pending:
        progressed = False
        for e in list(pending):
            if e.a.table in visited or e.b.table in visited:
                ordered.append(e)
                visited.update((e.a.table, e.b.table))
                pending.remove(e)
                progressed = True
        if not progressed:  # disconnected graph — cannot materialize
            raise ValueError(f"disconnected join graph: {spec.graph}")
    return ordered


def materialize_spark(spark: SparkSession, collection: TableCollection,
                      spec: ViewSpec) -> DataFrame:
    """One PJ-view as a Spark DataFrame (inner joins + projection +
    distinct)."""
    frames: dict[str, DataFrame] = {}
    for t in spec.graph.tables:
        df = collection.spark_table(spark, t)
        frames[t] = df.select(
            [F.col(c).alias(_qual(t, c)) for c in df.columns]
        )
    ordered = _join_order(spec)
    tables = sorted(spec.graph.tables)
    result = frames[tables[0]]
    joined = {tables[0]}
    for e in ordered:
        cond = F.col(_qual(e.a.table, e.a.column)) == F.col(
            _qual(e.b.table, e.b.column))
        new = ({e.a.table, e.b.table} - joined)
        if new:
            (t_new,) = new
            result = result.join(frames[t_new], on=cond, how="inner")
            joined.add(t_new)
        else:  # cycle edge: both sides present — apply as a filter
            result = result.where(cond)
    names = output_names(spec, collection)
    if spec.project_all:
        t = spec.projection[0].table
        sel = [F.col(_qual(t, n)).alias(n) for n in names]
    else:
        sel = [F.col(_qual(c.table, c.column)).alias(n)
               for c, n in zip(spec.projection, names)]
    return result.select(sel).dropna(how="any").distinct()


def materialize_pandas(collection: TableCollection,
                       spec: ViewSpec) -> pd.DataFrame:
    """Same view via pandas merges (the paper's engine)."""
    frames = {
        t: collection.tables[t].rename(
            columns={c: _qual(t, c) for c in collection.tables[t].columns}
        )
        for t in spec.graph.tables
    }
    tables = sorted(spec.graph.tables)
    result = frames[tables[0]]
    joined = {tables[0]}
    for e in _join_order(spec):
        la, lb = _qual(e.a.table, e.a.column), _qual(e.b.table, e.b.column)
        new = {e.a.table, e.b.table} - joined
        if new:
            (t_new,) = new
            left_key, right_key = (la, lb) if e.a.table in joined else (lb, la)
            result = result.merge(frames[t_new], left_on=left_key,
                                  right_on=right_key, how="inner")
            joined.add(t_new)
        else:
            result = result[result[la] == result[lb]]
    names = output_names(spec, collection)
    if spec.project_all:
        t = spec.projection[0].table
        cols = {_qual(t, n): n for n in names}
    else:
        cols = {}
        for c, n in zip(spec.projection, names):
            cols[_qual(c.table, c.column)] = n
    out = result[list(cols)].rename(columns=cols)
    return out.dropna(how="any").drop_duplicates().reset_index(drop=True)


def materialize_views(collection: TableCollection, specs: list[ViewSpec],
                      spark: SparkSession | None = None,
                      engine: str = "pandas",
                      drop_empty: bool = True) -> list[MaterializedView]:
    """Materialize every spec; empty views (failed joins) are dropped as
    in the paper's pipeline. View ids are assigned in spec order, which
    is the join-score ranking from JOIN-GRAPH-SEARCH."""
    out: list[MaterializedView] = []
    for spec in specs:
        if engine == "spark":
            if spark is None:
                raise ValueError("spark session required for engine='spark'")
            pdf = materialize_spark(spark, collection, spec).toPandas()
        elif engine == "pandas":
            pdf = materialize_pandas(collection, spec)
        else:
            raise ValueError(f"unknown engine {engine!r}")
        if drop_empty and pdf.empty:
            continue
        out.append(MaterializedView(len(out), spec,
                                    pdf.reset_index(drop=True)))
    return out
