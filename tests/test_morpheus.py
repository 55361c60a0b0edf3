"""Morpheus substrate: factorized ops equal materialized ops, and the
§9.2.1 interplay — HADAD rewrites change which pushdown applies."""
import numpy as np
import pytest

from repro.core.expr import colsums, mat, rowsums, tsum
from repro.core.rewriter import hadad_rewrite
from repro.linalg import ops
from repro.linalg.coo import from_numpy
from repro.morpheus.bench import gen_normalized, pipelines, run_one
from repro.morpheus.executor import MorpheusExecutor
from repro.morpheus.normalized import NormalizedMatrix


@pytest.fixture(scope="module")
def nm(spark):
    return gen_normalized(spark, n_r=30, d_r=6, d_s=4, tuple_ratio=3, seed=2)


@pytest.fixture(scope="module")
def dense(nm):
    return nm.materialize().to_numpy()


def test_shape(nm):
    assert nm.shape == (90, 10)


def test_materialize_is_cbind_s_kr(nm, dense):
    s = nm.S.to_numpy()
    kr = nm.K.to_numpy() @ nm.R.to_numpy()
    np.testing.assert_allclose(dense, np.hstack([s, kr]))


def test_factorized_rmul(spark, nm, dense):
    g = np.random.default_rng(5)
    n = g.random((10, 7))
    got = nm.rmul(from_numpy(spark, n)).to_numpy()
    np.testing.assert_allclose(got, dense @ n, rtol=1e-9)


def test_factorized_lmul(spark, nm, dense):
    g = np.random.default_rng(6)
    c = g.random((5, 90))
    got = nm.lmul(from_numpy(spark, c)).to_numpy()
    np.testing.assert_allclose(got, c @ dense, rtol=1e-9)


def test_factorized_rowsums(nm, dense):
    np.testing.assert_allclose(nm.rowsums().to_numpy().ravel(),
                               dense.sum(axis=1), rtol=1e-9)


def test_factorized_colsums(nm, dense):
    np.testing.assert_allclose(nm.colsums().to_numpy().ravel(),
                               dense.sum(axis=0), rtol=1e-9)


def test_factorized_sum(nm, dense):
    assert nm.total_sum() == pytest.approx(dense.sum(), rel=1e-9)


def test_inconsistent_factors_rejected(spark):
    a = from_numpy(spark, np.ones((4, 2)))
    with pytest.raises(ValueError):
        NormalizedMatrix(a, a, a)  # K.c != R.r


def test_executor_uses_factorized_paths(spark, nm, dense):
    env = {"M": nm}
    ex = MorpheusExecutor(spark, env)
    M = mat("M", *nm.shape)
    np.testing.assert_allclose(
        ex.run(rowsums(M)).to_numpy().ravel(), dense.sum(axis=1), rtol=1e-9)
    assert ex.run(tsum(M)) == pytest.approx(dense.sum(), rel=1e-9)


def test_executor_materializes_unfactorized_ops(spark, nm, dense):
    env = {"M": nm, "Nb": from_numpy(spark, np.ones(nm.shape))}
    M, Nb = mat("M", *nm.shape), mat("Nb", *nm.shape)
    got = MorpheusExecutor(spark, env).run(tsum(Nb + M))
    assert got == pytest.approx(dense.sum() + dense.size, rel=1e-9)


@pytest.mark.parametrize("pid", ["P1.12", "P2.10", "P2.11", "P2.15"])
def test_run_one_correct_and_rewritten(spark, nm, pid):
    run = run_one(spark, pid, nm, tuple_ratio=3, check=True)
    assert run.rel_diff < 1e-8
    assert run.rewrite  # a rewrite string is always reported


def test_hadad_enables_colsums_pushdown(spark, nm):
    """§2: colSums(MN) -> colSums(M)N flips Morpheus from multiplication
    pushdown to the (cheaper) colSums pushdown."""
    e = pipelines(nm)["P1.12"]
    rw = hadad_rewrite(e)
    from repro.core import expr as E
    assert isinstance(rw.best, E.MatMul)
    assert isinstance(rw.best.a, E.ColAgg)
