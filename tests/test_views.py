"""Views-as-constraints (§6.2.4): V_IO/V_OI generation, view leaves,
and paper Example 4.1 (the PACB view-rewriting example, LA-encoded)."""
import pytest

from repro.core.chase import Store, chase
from repro.core.constraints import Cst
from repro.core.cost import NaiveEstimator
from repro.core.encode import encode_expr
from repro.core.expr import Mat, colsums, inv, mat, rowsums, tsum
from repro.core.rewriter import default_rules, hadad_rewrite
from repro.core.views import View, view_leaf, view_rules

A = mat("A", 8, 8)
B = mat("B", 8, 8)


def test_view_rules_have_io_and_oi():
    rules = view_rules(View("V", A + B))
    names = {r.name for r in rules}
    assert names == {"view:V:IO", "view:V:OI"}
    io = next(r for r in rules if r.name.endswith("IO"))
    assert io.conclusion[0].pred == "name"
    assert io.conclusion[0].args[1] == Cst("V")


def test_view_oi_is_reverse_of_io():
    io, oi = view_rules(View("V", A + B))
    assert set(io.premise) == set(oi.conclusion)
    assert set(io.conclusion) == set(oi.premise)


def test_view_leaf_stats_from_definition():
    sparse = mat("S", 100, 100, nnz=10)
    v = View("V", sparse * sparse)   # Hadamard keeps nnz <= 10
    leaf = view_leaf(v, NaiveEstimator())
    assert leaf.shape == (100, 100) and leaf.nnz == 10


def test_scalar_view_rejected_vs_matrix_root():
    with pytest.raises(ValueError):
        view_rules(View("V", __import__("repro.core.expr", fromlist=["ConstS"]).ConstS(2.0)))


def test_io_introduces_view_atom_in_chase():
    s = Store(estimator=NaiveEstimator())
    encode_expr(A + B, s)
    chase(s, default_rules() + view_rules(View("V", B + A)))
    names = {s.const_of.get(s.find(n)) for (_, n) in s.atoms["name"]}
    assert "V" in names  # commutativity + IO constraint


def test_example_4_1_join_view_analogue():
    """PACB Example 4.1 transposed to VREM: V materializes R @ S and the
    query R @ S is answered by a scan of V alone."""
    R = mat("R", 10, 4)
    S = mat("S", 4, 10)
    v = View("V", R @ S)
    r = hadad_rewrite(R @ S, views=[v])
    assert r.best == Mat("V", 10, 10, nnz=100)
    assert r.used_views == ("V",)


def test_view_not_used_when_costlier():
    """A view over an unrelated product must not leak into the plan."""
    R = mat("R", 10, 4)
    S = mat("S", 4, 10)
    v = View("V", S @ R)
    r = hadad_rewrite(R @ S, views=[v])
    assert r.used_views == ()


def test_view_partial_use_inside_larger_plan():
    M = mat("M", 30, 6)
    N = mat("N", 6, 30)
    v = View("V3", N @ M)
    r = hadad_rewrite((M @ N) @ M, views=[v])
    assert r.used_views == ("V3",)  # M @ V3
