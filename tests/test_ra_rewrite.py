"""SPJ view matcher for the Q_RA preprocessing stage, checked against the
DuckDB oracle."""
import pandas as pd
import pytest

from repro.hybrid.ra_rewrite import (MaterializedSPJView, SPJSpec, match_view,
                                     rewrite_with_views)
from repro.oracle import assert_equivalent

TABLES = frozenset({"t", "u"})
JOINS = frozenset({("t.id", "u.id")})


def _spec(filters, cols=("a", "b")):
    return SPJSpec(TABLES, JOINS, frozenset(filters), tuple(cols))


def test_match_subset_filters():
    v = MaterializedSPJView("v", _spec([("c", "=", 1)], ("a", "b", "d")), None)
    q = _spec([("c", "=", 1), ("d", "<", 4)])
    assert match_view(q, v) == (("d", "<", 4),)


def test_no_match_when_view_more_selective():
    v = MaterializedSPJView("v", _spec([("c", "=", 1), ("d", "<", 2)]), None)
    q = _spec([("c", "=", 1)])
    assert match_view(q, v) is None


def test_no_match_missing_residual_column():
    v = MaterializedSPJView("v", _spec([("c", "=", 1)], ("a", "b")), None)
    q = _spec([("c", "=", 1), ("d", "<", 4)])
    assert match_view(q, v) is None   # view lost column d


def test_no_match_different_tables():
    v = MaterializedSPJView(
        "v", SPJSpec(frozenset({"t"}), frozenset(), frozenset(), ("a",)), None)
    assert match_view(_spec([], ("a",)), v) is None


def test_exact_match_no_residual():
    v = MaterializedSPJView("v", _spec([("c", "=", 1)]), None)
    assert match_view(_spec([("c", "=", 1)]), v) == ()


def test_rewrite_executes_view_plan(spark):
    t = pd.DataFrame({"id": [1, 2, 3, 4], "a": [10, 20, 30, 40],
                      "c": [1, 1, 1, 2], "d": [1, 5, 2, 1]})
    u = pd.DataFrame({"id": [1, 2, 3, 4], "b": [5, 6, 7, 8]})
    joined = t.merge(u, on="id")
    view_df = spark.createDataFrame(joined[joined.c == 1])
    v = MaterializedSPJView(
        "v", _spec([("c", "=", 1)], ("id", "a", "b", "c", "d")), view_df)
    q = SPJSpec(TABLES, JOINS,
                frozenset({("c", "=", 1), ("d", "<", 4)}), ("a", "b"))
    out, plan = rewrite_with_views(q, [v], fallback=lambda: None)
    assert plan.startswith("view:v")
    assert_equivalent(
        out,
        "SELECT a, b FROM t JOIN u USING (id) WHERE c = 1 AND d < 4",
        t=t, u=u)


def test_rewrite_falls_back_without_view(spark):
    t = pd.DataFrame({"id": [1], "a": [10], "c": [9], "d": [0]})
    u = pd.DataFrame({"id": [1], "b": [5]})
    q = _spec([("c", "=", 1)])
    sentinel = spark.createDataFrame(t)
    out, plan = rewrite_with_views(q, [], fallback=lambda: sentinel)
    assert plan == "base" and out is sentinel
