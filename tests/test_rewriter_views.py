"""§9.1.2 / Table 15: view-based rewriting for the 30 P^Views pipelines."""
import numpy as np
import pytest

from repro.bench.expected import EXPECTED_VIEWS, VIEWS_EXP, VIEWS_FOR, vmat
from repro.bench.pipelines import ALL
from repro.core import expr as E
from repro.core.cost import NaiveEstimator, gamma
from repro.core.npexec import env_for, eval_np
from repro.core.rewriter import hadad_rewrite, proves_equiv

EST = NaiveEstimator()
PIDS = sorted(EXPECTED_VIEWS)


@pytest.mark.parametrize("pid", PIDS)
def test_expected_view_rewrite_proven(pid):
    vs = [VIEWS_EXP[n] for n in VIEWS_FOR[pid]]
    assert proves_equiv(ALL[pid], EXPECTED_VIEWS[pid], views=vs), pid


@pytest.mark.parametrize("pid", PIDS)
def test_view_plan_at_most_expected_cost(pid):
    vs = [VIEWS_EXP[n] for n in VIEWS_FOR[pid]]
    r = hadad_rewrite(ALL[pid], views=vs)
    assert gamma(r.best, EST) <= gamma(EXPECTED_VIEWS[pid], EST) + 1e-6


@pytest.mark.parametrize("pid", sorted(set(PIDS) - {"P2.22", "P2.26"}))
def test_view_plan_numerically_equal(pid):
    """Evaluate original vs view-based plan, with views materialized from
    their definitions (exp pipelines excluded: 200x200 expm in numpy is
    slow, covered separately)."""
    vs = [VIEWS_EXP[n] for n in VIEWS_FOR[pid]]
    r = hadad_rewrite(ALL[pid], views=vs)
    env = env_for(ALL[pid], seed=5)
    for v in vs:
        venv = env_for(v.expr, seed=5)
        venv.update(env)
        env.update(venv)
        val = eval_np(v.expr, env)
        env[v.name] = val if isinstance(val, np.ndarray) else np.array([[val]])
    a = eval_np(ALL[pid], env)
    b = eval_np(r.best, env)
    np.testing.assert_allclose(np.atleast_2d(np.asarray(a)),
                               np.atleast_2d(np.asarray(b)),
                               rtol=1e-5, atol=1e-6)


def test_views_used_reported(pid="P2.21"):
    vs = [VIEWS_EXP[n] for n in VIEWS_FOR[pid]]
    r = hadad_rewrite(ALL[pid], views=vs)
    assert r.used_views == ("V1",)


def test_scalar_view_leaf_shape():
    m = vmat("V10")
    assert m.shape == (1, 1)


def test_view_count_matches_table_14():
    assert len(VIEWS_EXP) == 12
    assert len(EXPECTED_VIEWS) == 30
