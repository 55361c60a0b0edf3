"""§9.2.2 (Figures 10-11): hybrid micro-benchmark — Q_RA + Q_LA, original
vs HADAD (RA view reuse + selection pushdown + LA rewriting)."""
import pytest

from repro.hybrid.datasets import twitter_like
from repro.hybrid.queries import build_context, run_hybrid_query

PIDS = ["P3.1", "P3.3", "P3.9", "P3.10"]


@pytest.fixture(scope="module")
def ctx(spark):
    t = twitter_like(spark, n_tweets=4000, n_users=200, n_hashtags=60,
                     keyword="covid", seed=9)
    return build_context(spark, t)


@pytest.mark.parametrize("pid", PIDS)
@pytest.mark.benchmark(group="hybrid-end-to-end")
def test_hybrid_query(benchmark, ctx, pid):
    """One benchmark per query; original/HADAD timings are reported via
    extra_info (the harness times both inside one run for a fair shared
    cache state)."""
    def go():
        return run_hybrid_query(ctx, pid, check=False)
    run = benchmark.pedantic(go, rounds=1, iterations=1)
    benchmark.extra_info.update({
        "t_original_s": round(run.t_original, 3),
        "t_hadad_s": round(run.t_hadad, 3),
        "speedup": round(run.speedup, 2),
        "rewrite": str(run.rw.best)[:120],
    })
