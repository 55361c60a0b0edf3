"""§9.1.1 (Figures 5, 6, 8): LA pipelines with no views — original
(Q_exec) vs HADAD rewriting (RW_exec) on the Spark COO substrate."""
import pytest

from repro.bench.harness import make_env
from repro.bench.pipelines import ALL
from repro.core.rewriter import hadad_rewrite
from repro.linalg.coo import CooMatrix
from repro.linalg.executor import SparkExecutor

#: a representative slice of the figures: transpose-of-product, inverse
#: chain, add-then-vector, sum(MN), chain order, rowSums(MN), sum(rowSums)
PIDS = ["P1.1", "P1.4", "P1.13", "P1.15", "P2.10", "P2.12"]


@pytest.fixture(scope="module")
def envs(spark):
    return {pid: make_env(spark, ALL[pid]) for pid in PIDS}


def _run(spark, env, expr):
    out = SparkExecutor(spark, env).eval(expr)
    if isinstance(out, CooMatrix):
        out.df.count()
    return out


@pytest.mark.parametrize("pid", PIDS)
@pytest.mark.benchmark(group="la-noviews-original")
def test_original(benchmark, spark, envs, pid):
    benchmark.pedantic(_run, args=(spark, envs[pid], ALL[pid]),
                       rounds=2, iterations=1, warmup_rounds=1)


@pytest.mark.parametrize("pid", PIDS)
@pytest.mark.benchmark(group="la-noviews-hadad")
def test_hadad_rewritten(benchmark, spark, envs, pid):
    rw = hadad_rewrite(ALL[pid])
    benchmark.extra_info["rewrite"] = str(rw.best)
    benchmark.pedantic(_run, args=(spark, envs[pid], rw.best),
                       rounds=2, iterations=1, warmup_rounds=1)
