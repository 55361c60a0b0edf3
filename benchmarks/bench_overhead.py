"""§9.1.3: rewriting time RW_find and its distribution — the optimizer
overhead, measured for both cost models, on improvable (P¬Opt) and
already-optimal (P^Opt) pipelines."""
import pytest

from repro.bench.harness import mnc_estimator_for
from repro.bench.pipelines import ALL
from repro.core.rewriter import hadad_rewrite

NOOPT = ["P1.1", "P1.13", "P2.10", "P2.25"]
OPT = ["P1.19", "P1.27", "P2.19", "P2.24"]


@pytest.mark.parametrize("pid", NOOPT + OPT)
@pytest.mark.benchmark(group="rw-find-naive")
def test_rw_find_naive(benchmark, pid):
    benchmark(lambda: hadad_rewrite(ALL[pid]))


@pytest.mark.parametrize("pid", NOOPT + OPT)
@pytest.mark.benchmark(group="rw-find-mnc")
def test_rw_find_mnc(benchmark, pid):
    est = mnc_estimator_for(ALL[pid])
    benchmark(lambda: hadad_rewrite(ALL[pid], estimator=est))
