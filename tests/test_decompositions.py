"""Matrix-decomposition constraints (§6.2.5, Table 10)."""
import numpy as np
import pytest

from repro.testkit.pairs import DECOMP_PAIRS
from repro.core import expr as E
from repro.core.expr import cho, mat, qr
from repro.core.npexec import env_for, eval_np
from repro.core.rewriter import hadad_rewrite, proves_equiv
from repro.core.views import View


@pytest.mark.parametrize("name,lhs,rhs", DECOMP_PAIRS,
                         ids=[p[0] for p in DECOMP_PAIRS])
def test_decomposition_numeric(name, lhs, rhs):
    env = env_for(lhs, 1)
    env.update({k: v for k, v in env_for(rhs, 1).items() if k not in env})
    np.testing.assert_allclose(np.asarray(eval_np(lhs, env)),
                               np.asarray(eval_np(rhs, env)), rtol=1e-7)


@pytest.mark.parametrize("name,lhs,rhs", DECOMP_PAIRS,
                         ids=[p[0] for p in DECOMP_PAIRS])
def test_engine_proves_decomposition(name, lhs, rhs):
    assert proves_equiv(lhs, rhs)


def test_example_6_2_view_answers_query():
    """Paper Example 6.2: V = N + L L^T with L = cho(M), M symmetric
    positive definite, answers E = M + N via (1) commutativity and
    (4) the Cholesky recomposition constraint."""
    M = mat("M", 5, 5, mtype="S")
    N = mat("N", 5, 5)
    v = View("V", N + cho(M) @ cho(M).T)
    q = M + N
    r = hadad_rewrite(q, views=[v])
    assert r.used_views == ("V",)
    assert r.best == mat("V", 5, 5, nnz=25)


def test_qr_of_orthogonal_is_identity():
    """§6.2.5: QR(Q) = [Q, I] for orthogonal Q — the fixed-point rules."""
    Q = mat("Q", 4, 4, mtype="O")
    assert proves_equiv(qr(Q, "R"), E.Ident(4))
    assert proves_equiv(qr(Q, "Q"), Q)
