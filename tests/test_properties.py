"""Every MMC_LAprop constraint: (1) numerically true, (2) provable by the
chase engine (Tables 8-9 of the paper)."""
import numpy as np
import pytest

from repro.testkit.pairs import ALL_ENGINE_PAIRS, CBIND_PAIRS, LA_PAIRS
from repro.core.npexec import env_for, eval_np
from repro.core.rewriter import proves_equiv


def _both_envs(lhs, rhs, seed=0):
    env = env_for(lhs, seed)
    env.update({k: v for k, v in env_for(rhs, seed).items() if k not in env})
    return env


@pytest.mark.parametrize("name,lhs,rhs", LA_PAIRS, ids=[p[0] for p in LA_PAIRS])
def test_la_property_numeric(name, lhs, rhs):
    env = _both_envs(lhs, rhs)
    a, b = eval_np(lhs, env), eval_np(rhs, env)
    np.testing.assert_allclose(np.asarray(a), np.asarray(b), rtol=1e-8, atol=1e-8)


@pytest.mark.parametrize("name,lhs,rhs", CBIND_PAIRS, ids=[p[0] for p in CBIND_PAIRS])
def test_cbind_law_numeric(name, lhs, rhs):
    env = _both_envs(lhs, rhs)
    np.testing.assert_allclose(np.asarray(eval_np(lhs, env)),
                               np.asarray(eval_np(rhs, env)), rtol=1e-8)


@pytest.mark.parametrize("name,lhs,rhs", ALL_ENGINE_PAIRS,
                         ids=[p[0] for p in ALL_ENGINE_PAIRS])
def test_engine_proves_equivalence(name, lhs, rhs):
    assert proves_equiv(lhs, rhs), f"chase cannot prove {name}"
