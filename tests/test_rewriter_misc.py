"""Worked examples from the paper body: §2 (OLS with V = X^-1, the
Morpheus colSums factorization enabler, the ALS sparse rewrite), §6.3
(Figure 3/4: the pipeline Q_p and its six rewritings), Example 7.2, and
the claim that HADAD subsumes the SystemML-lite baseline."""
import numpy as np
import pytest

from repro.baselines.systemml_lite import systemml_lite_rewrite
from repro.bench.pipelines import ALL, P_NOOPT
from repro.core import expr as E
from repro.core.cost import NaiveEstimator, gamma
from repro.core.expr import colsums, inv, mat, rowsums, tsum
from repro.core.rewriter import hadad_rewrite, proves_equiv
from repro.core.views import View

EST = NaiveEstimator()


def test_section2_ols_with_inverse_view():
    """(X^T X)^-1 (X^T y) rewritten to V (V^T (X^T y)) with V = X^-1."""
    X = mat("X", 80, 80)
    y = mat("y", 80, 1)
    v = View("V", inv(X))
    pipeline = inv(X.T @ X) @ (X.T @ y)
    expected = mat("V", 80, 80, nnz=6400) @ (mat("V", 80, 80, nnz=6400).T @ (X.T @ y))
    r = hadad_rewrite(pipeline, views=[v])
    assert "V" in r.used_views
    assert gamma(r.best, EST) <= gamma(expected, EST) + 1e-6
    assert proves_equiv(pipeline, expected, views=[v])


def test_section2_morpheus_colsums_pushout():
    """colSums(MN) -> colSums(M)N (the rewrite that enables Morpheus'
    colSums pushdown instead of its multiplication pushdown)."""
    M = mat("M", 2000, 12)
    N = mat("N", 12, 10)
    r = hadad_rewrite(colsums(M @ N))
    assert r.best == colsums(M) @ N


def test_section2_als_sparse_distribution():
    """(uv^T - N)v -> u(v^T v) - Nv, exploiting N's ultra-sparsity."""
    u = mat("u", 2000, 1)
    v = mat("v", 100, 1)
    N = mat("N", 2000, 100, nnz=40)
    r = hadad_rewrite((u @ v.T - N) @ v)
    assert r.cost_after < r.cost_before / 100
    assert proves_equiv(r.best, u @ (v.T @ v) - N @ v)


def test_figure_3_4_qp_all_six_rewritings():
    """Q_p = (M^-1 + N)^T; the view V = N^T + (M^T)^-1 answers it fully,
    and the five property-only rewritings of Figure 4 are all equivalent."""
    M = mat("M", 40, 40)
    N = mat("N", 40, 40)
    qp = (inv(M) + N).T
    v = View("V", N.T + inv(M.T))
    rws = [
        inv(M).T + N.T,        # RW1
        inv(M.T) + N.T,        # RW2
        N.T + inv(M).T,        # RW3
        N.T + inv(M.T),        # RW4
        (N + inv(M)).T,        # RW5
    ]
    for i, rw in enumerate(rws, 1):
        assert proves_equiv(qp, rw), f"RW{i}"
    r = hadad_rewrite(qp, views=[v])
    assert r.used_views == ("V",)
    assert r.best == mat("V", 40, 40, nnz=1600)


def test_example_7_2_pruning_keeps_cheap_plan():
    M = mat("M", 500, 10)
    N = mat("N", 10, 500)
    r = hadad_rewrite(M @ (N @ M), prune=True)
    assert r.best == M @ (N @ M)
    assert r.chase_stats.pruned > 0


def test_pruning_never_worsens_result():
    for pid in ["P1.1", "P1.13", "P1.15", "P2.10", "P2.12"]:
        rp = hadad_rewrite(ALL[pid], prune=True)
        rn = hadad_rewrite(ALL[pid], prune=False)
        assert rp.cost_after <= rn.cost_after + 1e-6, pid


@pytest.mark.parametrize("pid", sorted(P_NOOPT))
def test_hadad_subsumes_systemml_lite(pid):
    """§9.3: HADAD's rewriting power strictly subsumes the platform's own
    static rules — never costlier than the lite baseline."""
    lite = systemml_lite_rewrite(ALL[pid])
    r = hadad_rewrite(ALL[pid])
    assert gamma(r.best, EST) <= gamma(lite, EST) + 1e-6


def test_rw_find_reported_and_small():
    r = hadad_rewrite(ALL["P1.1"])
    assert 0 < r.rw_find_s < 5.0


def test_decode_to_native_syntax():
    from repro.core.decode import to_dml, to_r
    r = hadad_rewrite(ALL["P1.3"])
    assert "solve(" in to_r(r.best)
    assert "inv(" in to_dml(r.best)


def test_estimator_choice_changes_costs_not_semantics():
    from repro.bench.harness import mnc_estimator_for
    e = ALL["P1.4"]
    est = mnc_estimator_for(e)
    r = hadad_rewrite(e, estimator=est)
    assert r.estimator_name == "mnc"
    assert proves_equiv(r.best, e)
