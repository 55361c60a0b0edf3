"""§9.2.1 (Figure 9): Morpheus alone vs Morpheus + HADAD on synthetic
PK-FK joins, at two tuple ratios."""
import pytest

from repro.core import expr as E
from repro.core.cost import JoinWorkEstimator
from repro.core.rewriter import hadad_rewrite
from repro.linalg.coo import CooMatrix, from_numpy
from repro.morpheus.bench import gen_normalized, pipelines
from repro.morpheus.executor import MorpheusExecutor

PIDS = ["P1.12", "P2.10", "P2.11", "P2.15"]
RATIOS = [4, 12]


@pytest.fixture(scope="module")
def setups(spark):
    import numpy as np
    out = {}
    for tr in RATIOS:
        nm = gen_normalized(spark, n_r=2000, d_r=20, d_s=10, tuple_ratio=tr)
        envs = {}
        g = np.random.default_rng(tr)
        for pid in PIDS:
            expr = pipelines(nm)[pid]
            env = {"M": nm}
            for name, leaf in E.base_matrices(expr).items():
                if name != "M":
                    env[name] = from_numpy(
                        spark, g.random(leaf.shape)).cached().materialize()
            envs[pid] = (expr, env,
                         hadad_rewrite(expr, estimator=JoinWorkEstimator()).best)
        out[tr] = envs
    return out


def _run(spark, env, expr):
    out = MorpheusExecutor(spark, env).eval(expr)
    if isinstance(out, CooMatrix):
        out.df.count()
    return out


@pytest.mark.parametrize("tr", RATIOS)
@pytest.mark.parametrize("pid", PIDS)
@pytest.mark.benchmark(group="morpheus-alone")
def test_morpheus_alone(benchmark, spark, setups, pid, tr):
    expr, env, _ = setups[tr][pid]
    benchmark.pedantic(_run, args=(spark, env, expr),
                       rounds=2, iterations=1, warmup_rounds=1)


@pytest.mark.parametrize("tr", RATIOS)
@pytest.mark.parametrize("pid", PIDS)
@pytest.mark.benchmark(group="morpheus-hadad")
def test_morpheus_plus_hadad(benchmark, spark, setups, pid, tr):
    expr, env, best = setups[tr][pid]
    benchmark.extra_info["rewrite"] = str(best)
    benchmark.pedantic(_run, args=(spark, env, best),
                       rounds=2, iterations=1, warmup_rounds=1)
