"""Theorem 8.1 (soundness) as a property test: for random hybrid
expressions, every plan HADAD returns is numerically equivalent to the
original and never costlier under the (monotonic) cost model."""
import numpy as np
from hypothesis import given, settings, strategies as st

from repro.core import expr as E
from repro.core.cost import NaiveEstimator, gamma
from repro.core.expr import mat
from repro.core.npexec import env_for, eval_np
from repro.core.rewriter import hadad_rewrite

EST = NaiveEstimator()
R, C, K = 7, 5, 4          # fixed dims keep generated shapes compatible
A = mat("A", R, C)
B = mat("B", R, C)
S = mat("S", C, C)
T = mat("T", C, R)
W = mat("W", R, R, nnz=9)  # sparse


def rc_exprs():
    """Random (R x C)-shaped matrix expressions of bounded depth."""
    base = st.sampled_from([A, B, W @ A, A @ S, (A + B) @ S])
    def step(e):
        return st.one_of(
            st.tuples(e, e).map(lambda t: t[0] + t[1]),
            st.tuples(e, e).map(lambda t: E.EMul(t[0], t[1])),
            e.map(lambda x: x @ S),
            e.map(lambda x: W @ x),
            e.map(lambda x: 2.0 * x),
            e.map(lambda x: (x.T).T),
        )
    return st.recursive(base, step, max_leaves=6)


def final():
    return st.one_of(
        rc_exprs(),
        rc_exprs().map(E.Tr),
        rc_exprs().map(lambda x: E.Sum(x, "sum")),
        rc_exprs().map(lambda x: E.ColAgg("sum", x)),
        rc_exprs().map(lambda x: E.RowAgg("sum", x)),
        rc_exprs().map(lambda x: E.Trace(x @ T)),
    )


@settings(max_examples=40, deadline=None)
@given(final())
def test_rewrite_is_sound_and_never_costlier(e):
    r = hadad_rewrite(e)
    assert gamma(r.best, EST) <= gamma(e, EST) + 1e-6
    env = env_for(e, seed=13)
    env.update({k: v for k, v in env_for(r.best, 13).items() if k not in env})
    a, b = eval_np(e, env), eval_np(r.best, env)
    np.testing.assert_allclose(np.atleast_2d(np.asarray(a)),
                               np.atleast_2d(np.asarray(b)),
                               rtol=1e-6, atol=1e-8)
