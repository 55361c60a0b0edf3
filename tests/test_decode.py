"""Extraction + decoding: min-cost plan per class, builders, tie-breaks,
native-syntax rendering."""
import pytest

from repro.core.chase import Store, chase
from repro.core.cost import NaiveEstimator
from repro.core.decode import extract_best, leaf_classes, to_dml, to_r
from repro.core.encode import encode_expr
from repro.core.expr import Mat, colsums, inv, mat, tsum
from repro.core.rewriter import default_rules


def _setup(e, rules=None):
    est = NaiveEstimator()
    s = Store(estimator=est)
    root = encode_expr(e, s)
    chase(s, rules if rules is not None else default_rules())
    leaves = {m.name: m for m in
              __import__("repro.core.expr", fromlist=["base_matrices"])
              .base_matrices(e).values()}
    return s, s.find(root), leaves, est


def test_extract_returns_cheapest_grouping():
    M = mat("M", 40, 5)
    N = mat("N", 5, 40)
    s, root, leaves, est = _setup((M @ N) @ M)
    best = extract_best(s, root, leaves, est)
    assert best.expr == M @ (N @ M)
    assert best.cost == 25 + 40 * 5  # inner product + final output


def test_leaf_classes_cover_names_and_consts():
    M = mat("M", 4, 4)
    s, root, leaves, est = _setup(2.0 * M, rules=[])
    lc = leaf_classes(s, leaves, est)
    exprs = {type(b.expr).__name__ for b in lc.values()}
    assert {"Mat", "ConstS"} <= exprs


def test_extract_handles_scalar_root():
    M = mat("M", 10, 3)
    N = mat("N", 3, 10)
    s, root, leaves, est = _setup(tsum(M @ N))
    best = extract_best(s, root, leaves, est)
    assert best.expr.shape == (1, 1)
    assert best.cost < 10 * 10  # far below materializing MN


def test_extract_prefers_fewer_ops_on_ties():
    A = mat("A", 6, 6)
    s, root, leaves, est = _setup(A.T.T)
    best = extract_best(s, root, leaves, est)
    assert best.expr == A and best.n_ops == 0


def test_unexecutable_classes_are_skipped():
    """type/name-only classes never yield plans; extraction still works."""
    S = mat("S", 5, 5, mtype="S")
    s, root, leaves, est = _setup(inv(S))
    best = extract_best(s, root, leaves, est)
    assert best is not None


def test_to_r_uses_solve():
    assert to_r(inv(mat("D", 3, 3))) == "solve(D)"


def test_to_dml_renders():
    e = colsums(mat("M", 3, 3)) @ mat("M", 3, 3)
    assert "%*%" in to_dml(e)
