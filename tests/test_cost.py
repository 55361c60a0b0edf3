"""Cost model γ + naïve worst-case estimator (§7.1, §7.2.1)."""
import pytest

from repro.core.cost import MatStats, NaiveEstimator, expr_stats, gamma
from repro.core.expr import Ident, ZeroM, colsums, det, inv, mat, rowsums, tsum

est = NaiveEstimator()


def test_example_7_1_chain_order():
    """γ((MN)M) = (50K)^2 and γ(M(NM)) = 100^2 (scaled here)."""
    M = mat("M", 500, 10)
    N = mat("N", 10, 500)
    assert gamma((M @ N) @ M, est) == 500 * 500
    assert gamma(M @ (N @ M), est) == 10 * 10


def test_gamma_excludes_root():
    A = mat("A", 10, 10)
    assert gamma(A @ A, est) == 0.0          # single op = the root
    assert gamma((A @ A) @ A, est) == 100.0  # one intermediate


def test_gamma_counts_shared_subexpr_once():
    A = mat("A", 10, 10)
    shared = A @ A
    e = (shared @ A) + (shared @ A)
    # shared (100) + shared@A counted once (100): DAG semantics
    assert gamma(e, est) == 200.0


def test_scalar_ops_cost_one():
    C = mat("C", 10, 10)
    D = mat("D", 10, 10)
    assert gamma(det(C) * det(C), est) == 1.0  # shared det counted once
    assert gamma(det(C) * det(D), est) == 2.0


def test_dense_matmul_bound():
    a, b = MatStats(100, 50, 5000), MatStats(50, 80, 4000)
    assert est.matmul(a, b).nnz == 100 * 80


def test_sparse_matmul_bound():
    a = MatStats(1000, 50, 20)     # ultra sparse
    b = MatStats(50, 80, 4000)     # dense
    assert est.matmul(a, b).nnz == 20 * 80


def test_add_bound():
    a = MatStats(10, 10, 30)
    b = MatStats(10, 10, 90)
    assert est.add(a, b).nnz == 100  # capped at dense


def test_emul_min_bound():
    assert est.emul(MatStats(10, 10, 30), MatStats(10, 10, 5)).nnz == 5


def test_transpose_keeps_nnz_swaps_dims():
    s = est.transpose(MatStats(4, 7, 9))
    assert (s.r, s.c, s.nnz) == (7, 4, 9)


def test_inverse_is_dense():
    assert est.dense_unary(MatStats(10, 10, 3)).nnz == 100


def test_agg_stats():
    a = MatStats(100, 20, 5)
    assert est.rowagg(a).nnz == 5
    c = est.colagg(a)
    assert (c.r, c.c) == (1, 20) and c.nnz == 5


def test_expr_stats_leaves():
    X = mat("X", 100, 50, nnz=7)
    assert expr_stats(X, est).nnz == 7
    assert expr_stats(Ident(5), est).nnz == 5
    assert expr_stats(ZeroM(3, 4), est).nnz == 0


def test_sparsity_drives_plan_choice():
    """The §2 ALS example: (uv^T - N)v vs uv^Tv - Nv with ultra-sparse N."""
    u = mat("u", 2000, 1)
    v = mat("v", 100, 1)
    N = mat("N", 2000, 100, nnz=40)
    orig = (u @ v.T - N) @ v
    rw = u @ (v.T @ v) - N @ v
    assert gamma(rw, est) < gamma(orig, est) / 100


def test_monotonic_cost():
    """§8 requires γ monotone: an expression never costs less than a
    subexpression."""
    M = mat("M", 30, 30)
    sub = M @ M
    e = tsum((sub @ M) + M)
    assert gamma(e, est) >= gamma(sub, est)
    assert gamma(e, est) >= gamma(sub @ M, est)


def test_propagate_dispatch_matches_methods():
    a, b = MatStats(4, 3, 12), MatStats(3, 5, 15)
    assert est.propagate("multi_M", [a, b])[0].nnz == est.matmul(a, b).nnz
    assert est.propagate("tr", [a])[0].c == 4
    assert est.propagate("sum", [a])[0].nnz == 1.0
    assert est.propagate("QR", [MatStats(3, 3, 9)])[0] is not None


def test_joinwork_estimator_charges_join_terms():
    from repro.core.cost import JoinWorkEstimator
    est2 = JoinWorkEstimator()
    a, b = MatStats(100, 50, 5000), MatStats(50, 80, 4000)
    out = est2.matmul(a, b)
    assert est2.op_size("multi_M", [a, b], out) == out.size + 5000 * 4000 / 50
    # non-product ops are unchanged
    assert est2.op_size("add_M", [a, a], a) == a.size


def test_joinwork_flips_morpheus_p210_choice():
    """rowSums(N M) with a small product output but a huge M operand: the
    output-size model keeps the original, the substrate-aware model picks
    the paper's N rowSums(M) rewrite (§9.2.1)."""
    from repro.core.cost import JoinWorkEstimator
    from repro.core.rewriter import hadad_rewrite
    from repro.core.expr import rowsums
    M = mat("M", 8000, 30)
    Nl = mat("Nl", 25, 8000)
    e = rowsums(Nl @ M)
    naive_best = hadad_rewrite(e).best
    work_best = hadad_rewrite(e, estimator=JoinWorkEstimator()).best
    assert work_best == Nl @ rowsums(M)
    assert naive_best == e  # output-size-only γ sees no gain


def test_joinwork_gamma_monotone():
    from repro.core.cost import JoinWorkEstimator
    est2 = JoinWorkEstimator()
    M = mat("M", 30, 30)
    sub = M @ M
    assert gamma(tsum(sub @ M), est2) >= gamma(sub, est2)
