"""MNC sparsity estimator (§7.2.2): histogram construction, derivation,
boundedness, and the cases where structure makes it exact."""
import numpy as np
import pytest

from repro.core.cost import MatStats, NaiveEstimator
from repro.core.expr import mat
from repro.core.mnc import MncEstimator, mnc_from_numpy


def test_histograms_from_numpy():
    a = np.array([[1.0, 0.0, 2.0], [0.0, 0.0, 0.0]])
    hr, hc = mnc_from_numpy(a)
    np.testing.assert_array_equal(hr, [2, 0])
    np.testing.assert_array_equal(hc, [1, 0, 1])


def test_leaf_uses_registered_histograms():
    est = MncEstimator()
    a = np.eye(5)
    est.register("D", a)
    s = est.leaf(mat("D", 5, 5))
    assert s.nnz == 5
    np.testing.assert_array_equal(s.hr, np.ones(5))


def test_leaf_synthesizes_uniform_histograms():
    est = MncEstimator()
    s = est.leaf(mat("X", 10, 4, nnz=20))
    assert s.hr is not None and pytest.approx(s.hr.sum()) == 20


def test_permutation_product_exact():
    """Structured case: P @ A with P a permutation — MNC's count product
    equals the true nnz."""
    est = MncEstimator()
    g = np.random.default_rng(0)
    p = np.eye(6)[g.permutation(6)]
    a = (g.random((6, 4)) < 0.4) * 1.0
    est.register("P", p)
    est.register("A", a)
    got = est.matmul(est.leaf(mat("P", 6, 6)), est.leaf(mat("A", 6, 4)))
    assert got.nnz == np.count_nonzero(p @ a)


def test_diagonal_product_exact():
    est = MncEstimator()
    d = np.diag([1.0, 2.0, 0.0, 3.0])
    a = (np.random.default_rng(1).random((4, 5)) < 0.5) * 1.0
    est.register("D", d)
    est.register("A", a)
    got = est.matmul(est.leaf(mat("D", 4, 4)), est.leaf(mat("A", 4, 5)))
    assert got.nnz >= np.count_nonzero(d @ a)  # upper bound, tight here up to zero rows
    assert got.nnz <= a.shape[1] * 4


def test_matmul_upper_bound_holds():
    est = MncEstimator()
    g = np.random.default_rng(2)
    a = (g.random((20, 15)) < 0.2) * 1.0
    b = (g.random((15, 12)) < 0.3) * 1.0
    est.register("A", a)
    est.register("B", b)
    got = est.matmul(est.leaf(mat("A", 20, 15)), est.leaf(mat("B", 15, 12)))
    assert got.nnz >= np.count_nonzero(a @ b) - 1e-9
    assert got.nnz <= 20 * 12


def test_add_emul_histogram_bounds():
    est = MncEstimator()
    g = np.random.default_rng(3)
    a = (g.random((10, 8)) < 0.3) * 1.0
    b = (g.random((10, 8)) < 0.3) * 1.0
    est.register("A", a)
    est.register("B", b)
    sa, sb = est.leaf(mat("A", 10, 8)), est.leaf(mat("B", 10, 8))
    assert est.add(sa, sb).nnz >= np.count_nonzero(a + b) - 1e-9
    assert est.emul(sa, sb).nnz >= np.count_nonzero(a * b) - 1e-9


def test_rowagg_counts_nonzero_rows():
    est = MncEstimator()
    a = np.zeros((6, 4))
    a[1, 2] = a[3, 0] = 1.0
    est.register("A", a)
    s = est.rowagg(est.leaf(mat("A", 6, 4)))
    assert s.nnz == 2 and (s.r, s.c) == (6, 1)


def test_transpose_swaps_histograms():
    est = MncEstimator()
    a = np.array([[1.0, 1.0, 0.0], [0.0, 0.0, 0.0]])
    est.register("A", a)
    s = est.leaf(mat("A", 2, 3))
    t = est.transpose(s)
    np.testing.assert_array_equal(t.hr, s.hc)
    np.testing.assert_array_equal(t.hc, s.hr)


def test_mnc_beats_naive_on_structured_sparsity():
    """A column-structured sparse matrix: naive worst-case grossly
    overestimates the product size, MNC does not."""
    naive = NaiveEstimator()
    mest = MncEstimator()
    a = np.zeros((40, 40))
    a[:, 0] = 1.0                      # all nnz in one column
    b = np.zeros((40, 40))
    b[1, :] = 1.0                      # all nnz in one row (not row 0!)
    mest.register("A", a)
    mest.register("B", b)
    sa, sb = mest.leaf(mat("A", 40, 40)), mest.leaf(mat("B", 40, 40))
    mnc_est = mest.matmul(sa, sb).nnz
    naive_est = naive.matmul(MatStats(40, 40, 40), MatStats(40, 40, 40)).nnz
    true = np.count_nonzero(a @ b)     # 0: the structures miss each other
    assert mnc_est <= naive_est
    assert mnc_est == true
