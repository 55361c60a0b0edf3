"""§9.1.2 (Figure 7): view-based LA rewriting — P2.14 (V3), P2.21 (V1,
OLS), P2.25 (V4, ALS building block), P2.27 (V5+V9)."""
import pytest

from repro.bench.expected import VIEWS_EXP, VIEWS_FOR
from repro.bench.harness import make_env
from repro.bench.pipelines import ALL
from repro.core.rewriter import hadad_rewrite
from repro.linalg.coo import CooMatrix
from repro.linalg.executor import SparkExecutor

PIDS = ["P2.14", "P2.21", "P2.25", "P2.27"]


@pytest.fixture(scope="module")
def setups(spark):
    out = {}
    for pid in PIDS:
        views = tuple(VIEWS_EXP[n] for n in VIEWS_FOR[pid])
        env = make_env(spark, ALL[pid], views)
        rw = hadad_rewrite(ALL[pid], views=views)
        out[pid] = (env, rw)
    return out


def _run(spark, env, expr):
    out = SparkExecutor(spark, env).eval(expr)
    if isinstance(out, CooMatrix):
        out.df.count()
    return out


@pytest.mark.parametrize("pid", PIDS)
@pytest.mark.benchmark(group="la-views-original")
def test_original(benchmark, spark, setups, pid):
    env, _ = setups[pid]
    benchmark.pedantic(_run, args=(spark, env, ALL[pid]),
                       rounds=2, iterations=1, warmup_rounds=1)


@pytest.mark.parametrize("pid", PIDS)
@pytest.mark.benchmark(group="la-views-hadad")
def test_hadad_with_views(benchmark, spark, setups, pid):
    env, rw = setups[pid]
    benchmark.extra_info["rewrite"] = str(rw.best)
    benchmark.extra_info["views"] = ",".join(rw.used_views)
    benchmark.pedantic(_run, args=(spark, env, rw.best),
                       rounds=2, iterations=1, warmup_rounds=1)
