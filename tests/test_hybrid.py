"""Hybrid micro-benchmark substrate (§9.2.2): dataset generators,
matrix construction (with oracle check), view materialization, LA-to-RA
selection pushdown, and end-to-end Q runs at tiny scale."""
import numpy as np
import pytest

from repro.core import expr as E
from repro.core.npexec import eval_np
from repro.core.rewriter import hadad_rewrite
from repro.hybrid.datasets import mimic_like, twitter_like
from repro.hybrid.queries import (build_context, build_N, hybrid_views,
                                  p3_pipelines, run_hybrid_query)
from repro.oracle import assert_equivalent

N_TWEETS, N_USERS, N_HASH = 1500, 60, 40


@pytest.fixture(scope="module")
def ctx(spark):
    t = twitter_like(spark, n_tweets=N_TWEETS, n_users=N_USERS,
                     n_hashtags=N_HASH, keyword="covid", seed=1)
    return build_context(spark, t)


def test_tables_have_expected_roles(ctx):
    assert ctx.nT > 50 and ctx.nU == N_USERS and ctx.nH == N_HASH
    assert set(ctx.env) >= {"M", "Tm", "Um", "K", "V3", "V4", "V5"}


def test_M_is_join_of_T_and_U(ctx):
    """M = [Tm, K Um] — the Morpheus normalized-join fact, verified on
    the actual data."""
    m = ctx.env["M"].to_numpy()
    t = ctx.env["Tm"].to_numpy()
    k = ctx.env["K"].to_numpy()
    u = ctx.env["Um"].to_numpy()
    np.testing.assert_allclose(m, np.hstack([t, k @ u]), rtol=1e-9)


def test_M_against_oracle(spark, ctx):
    coo = ctx.env["M"].df
    tweet = ctx.tables.tweet.where("row_id >= 0").toPandas()
    user = ctx.tables.user.toPandas()
    feats = [f"tf{i}" for i in range(6)] + [f"uf{i}" for i in range(6)]
    cases = " ".join(
        f"WHEN {j} THEN {c}" for j, c in enumerate(feats))
    sql = f"""
      WITH joined AS (SELECT * FROM tweet JOIN "user" USING (u_id))
      SELECT CAST(row_id AS BIGINT) AS i, CAST(n AS BIGINT) AS j,
             CAST(CASE n {cases} END AS DOUBLE) AS v
      FROM joined, range(12) r(n)
      WHERE CASE n {cases} END <> 0
    """
    assert_equivalent(coo, sql, tweet=tweet, user=user)


def test_view_matrices_match_definitions(ctx):
    t = ctx.env["Tm"].to_numpy()
    k = ctx.env["K"].to_numpy()
    u = ctx.env["Um"].to_numpy()
    m = ctx.env["M"].to_numpy()
    np.testing.assert_allclose(ctx.env["V3"].to_numpy().ravel(),
                               m.sum(axis=1), rtol=1e-9)
    np.testing.assert_allclose(ctx.env["V4"].to_numpy().ravel(),
                               m.sum(axis=0), rtol=1e-9)
    c9 = ctx.env["C9"].to_numpy()
    np.testing.assert_allclose(ctx.env["V5"].to_numpy(), c9 @ m, rtol=1e-8)


def test_build_N_view_equals_raw(ctx):
    raw, plan_raw = build_N(ctx, use_view=False, push_filter=True)
    via, plan_view = build_N(ctx, use_view=True, push_filter=True)
    assert plan_raw == "base" and plan_view.startswith("view:")
    np.testing.assert_allclose(via.to_numpy(), raw.to_numpy())


def test_filter_pushdown_equals_la_filter(ctx):
    from repro.linalg import ops
    raw, _ = build_N(ctx, use_view=False, push_filter=False)
    la_filtered = ops.filter_values(raw, lambda v: v < 4)
    pushed, _ = build_N(ctx, use_view=True, push_filter=True)
    np.testing.assert_allclose(pushed.to_numpy(), la_filtered.to_numpy())


def test_p3_pipelines_shapes():
    ps = p3_pipelines(100, 30)
    assert ps["P3.1"].shape == (30, 1)
    assert ps["P3.2"].shape == (100, 30)
    assert ps["P3.3"].shape == (100, 12)
    assert ps["P3.4"].is_scalar
    assert ps["P3.7"].shape == (12, 1)
    assert ps["P3.8"].shape == (100, 30)
    assert len(ps) == 10


def test_hybrid_views_definitions_numeric():
    views, fact = hybrid_views(50, 10, 8)
    g = np.random.default_rng(0)
    t, u = g.random((50, 6)), g.random((10, 6))
    k = np.zeros((50, 10))
    k[np.arange(50), g.integers(0, 10, 50)] = 1
    env = {"Tm": t, "Um": u, "K": k, "C9": g.random((8, 50))}
    m = np.hstack([t, k @ u])
    env["M"] = m
    np.testing.assert_allclose(np.asarray(eval_np(fact[1], env)), m)
    np.testing.assert_allclose(eval_np(views[0].expr, env).ravel(), m.sum(axis=1))
    np.testing.assert_allclose(eval_np(views[1].expr, env).ravel(), m.sum(axis=0))


@pytest.mark.parametrize("pid", ["P3.1", "P3.3", "P3.9"])
def test_hybrid_rewrite_uses_views_or_properties(ctx, pid):
    expr = p3_pipelines(ctx.nT, ctx.nH)[pid]
    r = hadad_rewrite(expr, views=ctx.views, equiv_facts=[ctx.fact])
    assert r.cost_after <= r.cost_before
    assert r.cost_after < r.cost_before  # all three have strict improvements


@pytest.mark.parametrize("pid", ["P3.1", "P3.4", "P3.10"])
def test_run_hybrid_query_end_to_end(ctx, pid):
    run = run_hybrid_query(ctx, pid)
    assert run.rel_diff < 1e-6, f"{pid}: wrong result after rewriting"
    assert run.ra_plan_hadad.startswith("view:")
    assert run.ra_plan_original == "base"


def test_mimic_like_scales_with_care_unit(spark):
    big = mimic_like(spark, n_admissions=800, n_patients=40, n_services=20,
                     care_unit="CCU")
    small = mimic_like(spark, n_admissions=800, n_patients=40, n_services=20,
                       care_unit="MICU")
    assert small.n_rows < big.n_rows
