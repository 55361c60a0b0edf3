"""The hybrid micro-benchmark (paper §9.2.2): Q_RA preprocessing in
SparkSQL + Q_LA analysis pipelines P3.1-P3.10 (Table 7).

Shape notes (documented deviations): the paper's printed P3.6 and P3.9
are dimension-inconsistent (its own DML listings would not type-check);
we use the nearest consistent forms that exercise the same rewrites —
P3.6 adds the two nH x 1 vectors, P3.9 uses the Hadamard form that the
accompanying text (property sum(CM) = sum(colSums(C)^T ⊙ rowSums(M)))
actually describes.
"""
from __future__ import annotations

import time
from dataclasses import dataclass, field

import numpy as np
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from ..core import expr as E
from ..core.expr import Mat, SMul, cbind, colsums, mat, rowsums, trace, tsum
from ..core.npexec import rand_for
from ..core.cost import JoinWorkEstimator
from ..core.rewriter import RewriteResult, hadad_rewrite
from ..core.views import View
from ..linalg import ops
from ..linalg.coo import CooMatrix, from_numpy
from ..linalg.executor import SparkExecutor
from .datasets import HybridTables
from .ra_rewrite import Filter, MaterializedSPJView, SPJSpec, rewrite_with_views

FEATS_T = [f"tf{i}" for i in range(6)]
FEATS_U = [f"uf{i}" for i in range(6)]


# ---------------------------------------------------------------------------
# Relation -> matrix conversions (paper §3's implicit casts)
# ---------------------------------------------------------------------------
def _melt_features(df: DataFrame, row_col: str, feats: list[str]) -> DataFrame:
    """Wide feature columns -> COO (i, j, v)."""
    arr = F.array(*[F.col(c).cast("double") for c in feats])
    return (df.select(F.col(row_col).cast("long").alias("i"),
                      F.posexplode(arr).alias("j", "v"))
            .select("i", F.col("j").cast("long").alias("j"), "v")
            .where(F.col("v") != 0.0))


def feature_matrix(df: DataFrame, row_col: str, feats: list[str],
                   r: int) -> CooMatrix:
    return CooMatrix(_melt_features(df, row_col, feats), r, len(feats))


# ---------------------------------------------------------------------------
# Context: all matrices + views + rewriting inputs for one scenario
# ---------------------------------------------------------------------------
@dataclass
class HybridContext:
    spark: SparkSession
    tables: HybridTables
    nT: int
    nU: int
    nH: int
    env: dict[str, object] = field(default_factory=dict)   # name -> CooMatrix
    leaves: dict[str, Mat] = field(default_factory=dict)
    views: list[View] = field(default_factory=list)
    fact: tuple[E.Expr, E.Expr] | None = None
    ra_views: list[MaterializedSPJView] = field(default_factory=list)


def p3_pipelines(nT: int, nH: int) -> dict[str, E.Expr]:
    """Table 7 pipelines over leaves M (nT x 12), N (nT x nH) + synthetic
    aux matrices (X* dense, C* dense, u/v vectors)."""
    M = mat("M", nT, 12)
    N = mat("N", nT, nH, nnz=max(1, nT))   # ultra-sparse; true nnz set later
    X = mat("X", nH, nT)
    X3 = mat("X3", nT, nH)
    X5 = mat("X5", 12, nH)
    X7 = mat("X7", 12, nT)
    C4 = mat("C4", nT, nH)
    C8 = mat("C8", nH, nH)
    C9 = mat("C9", nH, nT)
    uh, ut = mat("uh", nH, 1), mat("ut", nT, 1)
    vt, vh, vr = mat("vt", nT, 1), mat("vh", nH, 1), mat("vr", 1, nH)
    return {
        "P3.1": rowsums(X @ M) + ((uh @ vt.T + N.T) @ vt),
        "P3.2": ut @ colsums((X @ M).T) + N,
        "P3.3": ((N + X3) @ vh) @ colsums(M),
        "P3.4": tsum(C4 + ((N @ rowsums(X @ M)) @ vr)),
        "P3.5": ut @ colsums(M @ X5) + N,
        "P3.6": rowsums((M @ X5).T) + ((uh @ vt.T + N.T) @ vt),
        "P3.7": X7 @ N @ uh + rowsums(M.T),
        "P3.8": SMul(trace(C8 + ((vh @ colsums(M @ X5)) @ C8)), N),
        "P3.9": SMul(tsum((colsums(C9).T) * rowsums(M)), X3) + N,
        "P3.10": SMul(tsum((X + C9) @ M), N),
    }


def hybrid_views(nT: int, nU: int, nH: int):
    """The three cross RA-LA views of §9.2.2 over the base tables viewed
    as matrices (Tm tweets x feats, Um users x feats, K FK indicator),
    plus the Morpheus normalized-join fact M = [Tm, K Um]."""
    Tm, Um = mat("Tm", nT, 6), mat("Um", nU, 6)
    K = mat("K", nT, nU, nnz=nT)
    C9 = mat("C9", nH, nT)
    Mleaf = mat("M", nT, 12)
    views = [
        View("V3", rowsums(Tm) + K @ rowsums(Um)),
        View("V4", cbind(colsums(Tm), colsums(K) @ Um)),
        View("V5", cbind(C9 @ Tm, (C9 @ K) @ Um)),
    ]
    fact = (Mleaf, cbind(Tm, K @ Um))
    return views, fact


def build_context(spark: SparkSession, tables: HybridTables,
                  seed: int = 3) -> HybridContext:
    nT, nU, nH = tables.n_rows, tables.n_users, tables.n_hashtags
    ctx = HybridContext(spark, tables, nT, nU, nH)

    filtered = tables.tweet.where(F.col("row_id") >= 0)
    Tm = feature_matrix(filtered, "row_id", FEATS_T, nT).cached().materialize()
    Um = feature_matrix(tables.user, "u_id", FEATS_U, nU).cached().materialize()
    K = CooMatrix(filtered.select(F.col("row_id").cast("long").alias("i"),
                                  F.col("u_id").cast("long").alias("j"),
                                  F.lit(1.0).alias("v")),
                  nT, nU).cached().materialize()
    ctx.env.update({"Tm": Tm, "Um": Um, "K": K})

    # M = join(T, U) cast as a matrix — the Q_RA output (always dense)
    joined = (filtered.join(tables.user, "u_id")
              .select("row_id", *FEATS_T, *FEATS_U))
    M = feature_matrix(joined, "row_id", FEATS_T + FEATS_U, nT)
    ctx.env["M"] = M.cached().materialize()

    # synthetic aux matrices for the P3 pipelines
    for m in p3_pipelines(nT, nH).values():
        for leaf in E.base_matrices(m).values():
            if leaf.name in ("M", "N") or leaf.name in ctx.env:
                continue
            ctx.env[leaf.name] = from_numpy(
                spark, rand_for(leaf, seed)).cached().materialize()

    # materialized hybrid views (computed once, like the paper's CSV views)
    views, fact = hybrid_views(nT, nU, nH)
    ctx.views, ctx.fact = views, fact
    ctx.env["V3"] = ops.add(ops.rowagg(Tm),
                            ops.matmul(K, ops.rowagg(Um))).cached().materialize()
    ctx.env["V4"] = ops.cbind(ops.colagg(Tm),
                              ops.matmul(ops.colagg(K), Um)).cached().materialize()
    c9 = ctx.env["C9"]
    ctx.env["V5"] = ops.cbind(ops.matmul(c9, Tm),
                              ops.matmul(ops.matmul(c9, K), Um)).cached().materialize()

    # RA view: country='US' slice of the exploded hashtag relation
    us = (tables.tweet_hashtag.join(tables.tweet, "t_id")
          .where(F.col("country") == "US")
          .select("t_id", "row_id", "keyword", "h_id", "filter_level"))
    spec = SPJSpec(tables=frozenset({"tweet_hashtag", "tweet"}),
                   joins=frozenset({("tweet_hashtag.t_id", "tweet.t_id")}),
                   filters=frozenset({("country", "=", "US")}),
                   columns=("t_id", "row_id", "keyword", "h_id", "filter_level"))
    us_df = us.cache()
    us_df.count()
    ctx.ra_views = [MaterializedSPJView("V_US_TH", spec, us_df)]
    return ctx


# ---------------------------------------------------------------------------
# Q_RA: construct N (with/without RA-view reuse and selection pushdown)
# ---------------------------------------------------------------------------
def _n_query_spec(keyword: str, push_filter: bool) -> SPJSpec:
    filters: set[Filter] = {("country", "=", "US"), ("keyword", "=", keyword)}
    if push_filter:
        filters.add(("filter_level", "<", 4))
    return SPJSpec(tables=frozenset({"tweet_hashtag", "tweet"}),
                   joins=frozenset({("tweet_hashtag.t_id", "tweet.t_id")}),
                   filters=frozenset(filters),
                   columns=("row_id", "h_id", "filter_level"))


def build_N(ctx: HybridContext, *, use_view: bool,
            push_filter: bool) -> tuple[CooMatrix, str]:
    """The tweet x hashtag filter-level matrix N for the scenario keyword.
    ``push_filter`` moves the LA stage's filter-level selection into Q_RA
    (the §2 pushdown); ``use_view`` answers Q_RA from the materialized
    country='US' view."""
    spec = _n_query_spec(ctx.tables.keyword, push_filter)

    def fallback() -> DataFrame:
        df = (ctx.tables.tweet_hashtag.join(ctx.tables.tweet, "t_id")
              .where((F.col("country") == "US")
                     & (F.col("keyword") == ctx.tables.keyword)))
        if push_filter:
            df = df.where(F.col("filter_level") < 4)
        return df.select("row_id", "h_id", "filter_level")

    df, plan = rewrite_with_views(spec, ctx.ra_views if use_view else [],
                                  fallback)
    coo = df.select(F.col("row_id").cast("long").alias("i"),
                    F.col("h_id").cast("long").alias("j"),
                    F.col("filter_level").cast("double").alias("v"))
    return CooMatrix(coo, ctx.nT, ctx.nH), plan


# ---------------------------------------------------------------------------
# End-to-end query runs
# ---------------------------------------------------------------------------
@dataclass
class HybridRun:
    pid: str
    t_original: float
    t_hadad: float
    rw: RewriteResult
    ra_plan_original: str
    ra_plan_hadad: str
    rel_diff: float

    @property
    def speedup(self) -> float:
        return self.t_original / max(self.t_hadad, 1e-9)


def _result_array(out) -> np.ndarray:
    if isinstance(out, CooMatrix):
        return out.to_numpy()
    return np.array([[float(out)]])


def run_hybrid_query(ctx: HybridContext, pid: str, *, check: bool = True) -> HybridRun:
    """Time original (raw Q_RA; LA as stated, filter in LA) vs HADAD
    (Q_RA via the RA view with the selection pushed down; LA rewritten
    with LA properties + the hybrid views)."""
    expr = p3_pipelines(ctx.nT, ctx.nH)[pid]

    # ---- original -------------------------------------------------------
    t0 = time.perf_counter()
    n_raw, plan_o = build_N(ctx, use_view=False, push_filter=False)
    nf = ops.filter_values(n_raw, lambda v: v < 4)   # selection in the LA stage
    nf.df.cache().count()
    env_o = dict(ctx.env)
    env_o["N"] = CooMatrix(nf.df, ctx.nT, ctx.nH)
    out_o = SparkExecutor(ctx.spark, env_o).run(expr)
    t_original = time.perf_counter() - t0

    # ---- HADAD ----------------------------------------------------------
    t0 = time.perf_counter()
    n_view, plan_h = build_N(ctx, use_view=True, push_filter=True)
    n_view = CooMatrix(n_view.df.cache(), ctx.nT, ctx.nH)
    nnz = n_view.df.count()
    leaves = {m.name: m for m in E.base_matrices(expr).values()}
    leaves["N"] = Mat("N", ctx.nT, ctx.nH, nnz=max(1, nnz))
    expr_n = _rebind(expr, leaves)
    # substrate-aware cost: COO matmuls materialize their join relation
    rw = hadad_rewrite(expr_n, views=ctx.views, equiv_facts=[ctx.fact],
                       estimator=JoinWorkEstimator(), max_atoms=1000)
    env_h = dict(ctx.env)
    env_h["N"] = n_view
    out_h = SparkExecutor(ctx.spark, env_h).run(rw.best)
    t_hadad = time.perf_counter() - t0

    diff = 0.0
    if check:
        a, b = _result_array(out_o), _result_array(out_h)
        if a.shape == (1, 1) or b.shape == (1, 1):
            diff = abs(float(a.reshape(-1)[0]) - float(b.reshape(-1)[0]))
            scale = max(1.0, abs(float(a.reshape(-1)[0])))
        else:
            diff = float(np.abs(a - b).max())
            scale = max(1.0, float(np.abs(a).max()))
        diff = diff / scale
    return HybridRun(pid, t_original, t_hadad, rw, plan_o, plan_h, diff)


def _rebind(e: E.Expr, leaves: dict[str, Mat]) -> E.Expr:
    """Replace leaf metadata (e.g. N's true nnz) throughout an expression."""
    if isinstance(e, Mat):
        return leaves.get(e.name, e)
    if not e.children():
        return e
    kwargs = {}
    for f in e.__dataclass_fields__:
        v = getattr(e, f)
        kwargs[f] = _rebind(v, leaves) if isinstance(v, E.Expr) else v
    return type(e)(**kwargs)
