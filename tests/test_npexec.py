"""Numpy reference executor vs hand-written numpy."""
import numpy as np
import pytest

from repro.core import expr as E
from repro.core.expr import mat
from repro.core.npexec import as_float, env_for, eval_np, rand_for

A = mat("A", 4, 3)
C = mat("C", 3, 3)


@pytest.fixture(scope="module")
def env():
    return env_for((A @ C) + A, seed=1)


def test_matmul(env):
    np.testing.assert_allclose(eval_np(A @ C, env), env["A"] @ env["C"])


def test_add_emul_ediv(env):
    b = {"A": env["A"], "B": env["A"] * 2 + 1.0}
    Bm = mat("B", 4, 3)
    np.testing.assert_allclose(eval_np(A + Bm, b), b["A"] + b["B"])
    np.testing.assert_allclose(eval_np(A * Bm, b), b["A"] * b["B"])
    np.testing.assert_allclose(eval_np(A / Bm, b), b["A"] / b["B"])


def test_transpose_inv_det_trace(env):
    np.testing.assert_allclose(eval_np(C.T, env), env["C"].T)
    np.testing.assert_allclose(eval_np(E.Inv(C), env), np.linalg.inv(env["C"]))
    assert eval_np(E.Det(C), env) == pytest.approx(np.linalg.det(env["C"]))
    assert eval_np(E.Trace(C), env) == pytest.approx(np.trace(env["C"]))


@pytest.mark.parametrize("kind,npf", [
    ("sum", np.sum), ("min", np.min), ("max", np.max),
    ("mean", np.mean), ("var", np.var)])
def test_full_aggs(env, kind, npf):
    assert eval_np(E.Sum(A, kind), env) == pytest.approx(npf(env["A"]))


@pytest.mark.parametrize("kind", ["sum", "min", "max", "mean", "var"])
def test_row_col_aggs(env, kind):
    got = eval_np(E.RowAgg(kind, A), env)
    ref = {"sum": np.sum, "min": np.min, "max": np.max,
           "mean": np.mean, "var": np.var}[kind](env["A"], axis=1)
    np.testing.assert_allclose(got.ravel(), ref)
    got_c = eval_np(E.ColAgg(kind, A), env)
    ref_c = {"sum": np.sum, "min": np.min, "max": np.max,
             "mean": np.mean, "var": np.var}[kind](env["A"], axis=0)
    np.testing.assert_allclose(got_c.ravel(), ref_c)


def test_expm_agrees_with_eigen():
    g = np.random.default_rng(0)
    a = g.standard_normal((5, 5)) * 0.3
    a = (a + a.T) / 2  # symmetric -> eigendecomposition is exact reference
    w, q = np.linalg.eigh(a)
    ref = q @ np.diag(np.exp(w)) @ q.T
    got = eval_np(E.MExp(mat("S", 5, 5)), {"S": a})
    np.testing.assert_allclose(got, ref, rtol=1e-8)


def test_adj_identity():
    env2 = env_for(E.Adj(C), seed=2)
    a = env2["C"]
    got = eval_np(E.Adj(C), env2)
    np.testing.assert_allclose(got @ a, np.linalg.det(a) * np.eye(3), atol=1e-8)


def test_cho_and_qr():
    S = mat("S", 5, 5, mtype="S")
    env2 = env_for(E.Cho(S), seed=3)
    L = eval_np(E.Cho(S), env2)
    np.testing.assert_allclose(L @ L.T, env2["S"], rtol=1e-8)
    q = eval_np(E.QrF(C, "Q"), env_for(E.QrF(C, "Q"), 1))
    np.testing.assert_allclose(q.T @ q, np.eye(3), atol=1e-8)


def test_lu_and_lup():
    D = mat("D", 5, 5)
    env2 = env_for(E.LuF(D, "L"), seed=4)
    L = eval_np(E.LuF(D, "L"), env2)
    U = eval_np(E.LuF(D, "U"), env2)
    np.testing.assert_allclose(L @ U, env2["D"], rtol=1e-8)
    Lp = eval_np(E.LupF(D, "L"), env2)
    Up = eval_np(E.LupF(D, "U"), env2)
    P = eval_np(E.LupF(D, "P"), env2)
    np.testing.assert_allclose(P @ env2["D"], Lp @ Up, rtol=1e-8)


def test_kron_dsum_cbind(env):
    got = eval_np(E.ProdD(C, C), env)
    np.testing.assert_allclose(got, np.kron(env["C"], env["C"]))
    ds = eval_np(E.SumD(C, C), env)
    assert ds.shape == (6, 6) and np.allclose(ds[:3, :3], env["C"])
    cb = eval_np(E.CBind(A, A), env)
    assert cb.shape == (4, 6)


def test_diag(env):
    np.testing.assert_allclose(eval_np(E.Diag(C), env).ravel(),
                               np.diag(env["C"]))


def test_scalar_arith(env):
    d = np.linalg.det(env["C"])
    t = np.trace(env["C"])
    assert eval_np(E.SAdd(E.Det(C), E.Trace(C)), env) == pytest.approx(d + t)
    assert eval_np(E.SMulS(E.Det(C), E.Trace(C)), env) == pytest.approx(d * t)
    assert eval_np(E.SInvS(E.Det(C)), env) == pytest.approx(1 / d)
    assert eval_np(E.SPow(E.Det(C), 2.0), env) == pytest.approx(d ** 2)


def test_as_float_coercion():
    assert as_float(np.array([[3.5]])) == 3.5
    assert as_float(2) == 2.0
    with pytest.raises(ValueError):
        as_float(np.zeros((2, 2)))


def test_rand_for_respects_nnz():
    m = mat("X", 20, 20, nnz=10)
    a = rand_for(m)
    assert np.count_nonzero(a) <= 10


def test_rand_for_mtypes():
    s = rand_for(mat("S", 6, 6, mtype="S"))
    np.testing.assert_allclose(s, s.T)
    assert np.all(np.linalg.eigvalsh(s) > 0)
    l_ = rand_for(mat("L", 6, 6, mtype="L"))
    assert np.allclose(l_, np.tril(l_))
    o = rand_for(mat("O", 6, 6, mtype="O"))
    np.testing.assert_allclose(o @ o.T, np.eye(6), atol=1e-8)


def test_shape_mismatch_env_raises():
    with pytest.raises(ValueError):
        eval_np(A, {"A": np.zeros((2, 2))})
