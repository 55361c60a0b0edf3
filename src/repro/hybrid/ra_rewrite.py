"""RA-side view-based rewriting for the preprocessing (Q_RA) stage.

The paper inherits full polystore rewriting from [15]; here we build the
select-project-join fragment that the hybrid benchmark exercises: a
query over base tables is answered from a materialized SPJ view when the
view joins the same tables, its filters are a subset of the query's, and
it retains the columns needed for the residual filters + projection.
This is classical view-based CQ rewriting restricted to SPJ with
conjunctive equality/range/LIKE filters — sound by construction
(filters only narrow the view's tuple set), and checked against the
DuckDB oracle in tests.

The LA-to-RA *selection pushdown* of §2 (filter-level < 4 moved from the
LA stage into preprocessing) is expressed by simply adding the predicate
to the query spec before matching.
"""
from __future__ import annotations

from dataclasses import dataclass, field

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

#: a filter is (column, op, value) with op in {"=", "<", "<=", ">", ">="}
Filter = tuple[str, str, object]


@dataclass(frozen=True)
class SPJSpec:
    """A select-project-join block: base tables, equality join conditions
    (t1.c1 = t2.c2), conjunctive filters, output columns."""

    tables: frozenset[str]
    joins: frozenset[tuple[str, str]]       # fully-qualified "table.col" pairs
    filters: frozenset[Filter]
    columns: tuple[str, ...]                # output column names (post-join)


@dataclass(frozen=True)
class MaterializedSPJView:
    name: str
    spec: SPJSpec
    df: DataFrame


def match_view(query: SPJSpec, view: MaterializedSPJView):
    """Residual filters if ``view`` answers ``query``, else None."""
    vs = view.spec
    if vs.tables != query.tables or vs.joins != query.joins:
        return None
    if not vs.filters <= query.filters:
        return None
    residual = query.filters - vs.filters
    needed = set(query.columns) | {c for (c, _, _) in residual}
    if not needed <= set(vs.columns):
        return None
    return tuple(sorted(residual))


def _apply_filter(df: DataFrame, f: Filter) -> DataFrame:
    col, op, val = f
    c = F.col(col)
    cond = {"=": c == val, "<": c < val, "<=": c <= val,
            ">": c > val, ">=": c >= val}[op]
    return df.where(cond)


def rewrite_with_views(query: SPJSpec, views: list[MaterializedSPJView],
                       fallback) -> tuple[DataFrame, str]:
    """Answer ``query`` from the first matching view (scan + residual
    filters + projection); otherwise run ``fallback()`` over base tables.
    Returns (DataFrame, plan description)."""
    for v in views:
        residual = match_view(query, v)
        if residual is not None:
            df = v.df
            for f in residual:
                df = _apply_filter(df, f)
            return df.select(*query.columns), f"view:{v.name}+{len(residual)}filters"
    return fallback(), "base"
