"""§9.1.1 / Appendix C Tables 12-13: for all 38 P¬Opt pipelines, HADAD
(1) proves the paper's expected rewrite equivalent,
(2) finds a plan at most as costly as the expected one, and
(3) the found plan is numerically equal to the original (numpy executor,
    on shrunken twins of the benchmark leaves)."""
import numpy as np
import pytest

from repro.bench.expected import EXPECTED_NOVIEWS
from repro.bench.pipelines import ALL, P_NOOPT, P_OPT
from repro.core import expr as E
from repro.core.cost import NaiveEstimator, gamma
from repro.core.npexec import env_for, eval_np
from repro.core.rewriter import hadad_rewrite, proves_equiv

EST = NaiveEstimator()


def _shrink(e: E.Expr, cap: int = 24) -> E.Expr:
    """Scale every leaf dimension (keeping ratios' sign of the shapes
    consistent) so numpy evaluation of the 38 pipelines stays instant."""
    dims: dict[int, int] = {}

    def newdim(d: int) -> int:
        if d not in dims:
            dims[d] = min(d, cap + len(dims))  # distinct dims stay distinct
        return dims[d]

    def rec(x: E.Expr) -> E.Expr:
        if isinstance(x, E.Mat):
            r, c = newdim(x.r), newdim(x.c)
            nnz = None if x.nnz is None else max(1, min(x.nnz, r * c // 2))
            return E.Mat(x.name, r, c, nnz, x.mtype)
        if isinstance(x, E.Ident):
            return E.Ident(newdim(x.k))
        if isinstance(x, E.ZeroM):
            return E.ZeroM(newdim(x.r), newdim(x.c))
        if not x.children():
            return x
        kwargs = {f: (rec(v) if isinstance(v, E.Expr) else v)
                  for f, v in ((f, getattr(x, f)) for f in x.__dataclass_fields__)}
        return type(x)(**kwargs)

    return rec(e)


@pytest.mark.parametrize("pid", P_NOOPT)
def test_expected_rewrite_is_proven_equivalent(pid):
    assert proves_equiv(ALL[pid], EXPECTED_NOVIEWS[pid]), pid


@pytest.mark.parametrize("pid", P_NOOPT)
def test_found_plan_at_most_expected_cost(pid):
    r = hadad_rewrite(ALL[pid])
    assert gamma(r.best, EST) <= gamma(EXPECTED_NOVIEWS[pid], EST) + 1e-6
    assert r.cost_after <= r.cost_before + 1e-6


@pytest.mark.parametrize("pid", P_NOOPT)
def test_found_plan_numerically_equal(pid):
    small = _shrink(ALL[pid])
    r = hadad_rewrite(small)
    env = env_for(small, seed=11)
    env.update({k: v for k, v in env_for(r.best, 11).items() if k not in env})
    a, b = eval_np(small, env), eval_np(r.best, env)
    np.testing.assert_allclose(np.atleast_2d(np.asarray(a)),
                               np.atleast_2d(np.asarray(b)),
                               rtol=1e-6, atol=1e-8)


@pytest.mark.parametrize("pid", P_OPT)
def test_already_optimal_pipelines_not_made_worse(pid):
    """§9.1.3: on P^Opt, HADAD must return a plan no worse than as-stated."""
    r = hadad_rewrite(ALL[pid])
    assert r.cost_after <= r.cost_before + 1e-6


def test_membership_counts_match_paper():
    assert len(P_NOOPT) == 38 and len(P_OPT) == 19
    assert len(ALL) == 57
