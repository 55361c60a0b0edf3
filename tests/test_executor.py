"""Spark executor end-to-end vs the numpy reference, including rewritten
plans — the substrate on which §9.1's Q_exec/RW_exec timings are taken."""
import numpy as np
import pytest

from repro.core import expr as E
from repro.core.expr import (colsums, det, inv, mat, rowsums, trace, tsum)
from repro.core.npexec import env_for, eval_np
from repro.core.rewriter import hadad_rewrite
from repro.linalg.coo import CooMatrix, from_numpy
from repro.linalg.executor import SparkExecutor, as_float

M = mat("M", 20, 6)
N = mat("N", 6, 20)
C = mat("C", 8, 8)
D = mat("D", 8, 8)
v = mat("v", 6, 1)

CASES = [
    ("matmul_t", (M @ N).T),
    ("chain", (M @ N) @ M),
    ("add_vec", (M + M) @ v),
    ("colsums_mm", colsums(M @ N)),
    ("sum_mm", tsum(M @ N)),
    ("inv_chain", inv(C @ D)),
    ("trace_add", trace(C + D)),
    ("det_t", det(D.T)),
    ("scalar_mix", E.SMulS(det(C), trace(D)) + tsum(M)),
    ("hadamard_div", M * ((M + M) / (3.0 * M + M))),
    ("rowsums_t", rowsums(M.T)),
    ("ols", inv(D.T @ D) @ (D.T @ mat("w", 8, 1))),
]


@pytest.fixture(scope="module")
def spark_env_factory(spark):
    def make(e, seed=21):
        env = env_for(e, seed)
        return env, {k: from_numpy(spark, a) for k, a in env.items()}
    return make


@pytest.mark.parametrize("name,e", CASES, ids=[c[0] for c in CASES])
def test_executor_matches_numpy(spark, spark_env_factory, name, e):
    np_env, sp_env = spark_env_factory(e)
    ref = eval_np(e, np_env)
    got = SparkExecutor(spark, sp_env).run(e)
    if isinstance(got, CooMatrix):
        np.testing.assert_allclose(got.to_numpy(), np.asarray(ref),
                                   rtol=1e-8, atol=1e-10)
    else:
        assert got == pytest.approx(float(ref), rel=1e-8)


@pytest.mark.parametrize("name,e", CASES[:8], ids=[c[0] for c in CASES[:8]])
def test_rewritten_plan_same_result_on_spark(spark, spark_env_factory, name, e):
    """Original vs HADAD-rewritten plan, both on the Spark substrate."""
    np_env, sp_env = spark_env_factory(e)
    rw = hadad_rewrite(e)
    a = SparkExecutor(spark, sp_env).run(e)
    b = SparkExecutor(spark, sp_env).run(rw.best)
    aa = a.to_numpy() if isinstance(a, CooMatrix) else np.array([[a]])
    bb = b.to_numpy() if isinstance(b, CooMatrix) else np.array([[b]])
    np.testing.assert_allclose(aa, bb.reshape(aa.shape), rtol=1e-8, atol=1e-10)


def test_memoized_subexpressions_share_lineage(spark, spark_env_factory):
    e = (M @ N) + (M @ N)
    np_env, sp_env = spark_env_factory(e)
    ex = SparkExecutor(spark, sp_env)
    memo = {}
    ex.eval(e, memo)
    assert (M @ N) in memo


def test_scalar_coercion_1x1(spark):
    one = from_numpy(spark, np.array([[4.0]]))
    assert as_float(one) == 4.0
    with pytest.raises(ValueError):
        as_float(from_numpy(spark, np.eye(2)))


def test_identity_and_zero_leaves(spark):
    e = E.Ident(4) @ mat("Z", 4, 3)
    env = {"Z": from_numpy(spark, np.arange(12.0).reshape(4, 3))}
    got = SparkExecutor(spark, env).run(e)
    np.testing.assert_allclose(got.to_numpy(), np.arange(12.0).reshape(4, 3))
    z = SparkExecutor(spark, env).run(E.ZeroM(4, 3) + mat("Z", 4, 3))
    np.testing.assert_allclose(z.to_numpy(), np.arange(12.0).reshape(4, 3))
