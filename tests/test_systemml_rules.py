"""MMC_StatAgg (SystemML rules, Table 11): numeric validation + the
SystemML-lite baseline behaviour."""
import numpy as np
import pytest

from repro.testkit.pairs import SYSML_PAIRS
from repro.baselines.systemml_lite import systemml_lite_rewrite
from repro.core import expr as E
from repro.core.expr import colsums, mat, rowsums, tsum
from repro.core.npexec import env_for, eval_np


@pytest.mark.parametrize("name,lhs,rhs", SYSML_PAIRS, ids=[p[0] for p in SYSML_PAIRS])
def test_systemml_rule_numeric(name, lhs, rhs):
    env = env_for(lhs, 3)
    env.update({k: v for k, v in env_for(rhs, 3).items() if k not in env})
    a, b = eval_np(lhs, env), eval_np(rhs, env)
    np.testing.assert_allclose(np.asarray(a), np.asarray(b), rtol=1e-8, atol=1e-10)


M = mat("M", 6, 4)
N = mat("N", 4, 6)


def test_lite_sum_transpose():
    assert systemml_lite_rewrite(tsum(M.T)) == tsum(M)


def test_lite_sum_matmul():
    out = systemml_lite_rewrite(tsum(M @ N))
    assert out == tsum(E.EMul(colsums(M).T, rowsums(N)))


def test_lite_agg_transpose_pushdown():
    assert systemml_lite_rewrite(rowsums(M.T)) == colsums(M).T


def test_lite_sum_add_pushdown():
    A = mat("A", 5, 5)
    B = mat("B", 5, 5)
    out = systemml_lite_rewrite(tsum(A + B))
    assert out == E.SAdd(tsum(A), tsum(B))


def test_lite_misses_P114_without_property_closure():
    """P1.14 (§6.2.6 Example 6.3): without the (MN)^T = N^T M^T closure the
    lite baseline lands on the RW2-style form with transposed aggregates of
    N^T / M^T; HADAD's plan (colSums(M)-based) is strictly cheaper."""
    from repro.core.cost import NaiveEstimator, gamma
    from repro.core.rewriter import hadad_rewrite
    Mb = mat("M", 60, 8)
    Nb = mat("N", 8, 60)
    p = tsum(colsums(Nb.T @ Mb.T))
    lite = systemml_lite_rewrite(p)
    best = hadad_rewrite(p).best
    est = NaiveEstimator()
    assert gamma(best, est) < gamma(lite, est)
    assert any(isinstance(n, E.Tr) for n in E.walk(lite))  # RW2 keeps transposes


def test_lite_preserves_semantics():
    for e in [tsum(M @ N), rowsums(M.T), tsum(colsums(N.T @ M.T)),
              E.Trace(M @ N)]:
        env = env_for(e, 5)
        a, b = eval_np(e, env), eval_np(systemml_lite_rewrite(e), env)
        np.testing.assert_allclose(np.asarray(a), np.asarray(b), rtol=1e-8)
