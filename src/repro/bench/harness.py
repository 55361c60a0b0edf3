"""Timing harness: Q_exec (pipeline as stated) vs RW_find + RW_exec
(HADAD rewriting + rewritten pipeline), both on the Spark COO substrate
— the measurement protocol of §9.1.
"""
from __future__ import annotations

import time
from dataclasses import dataclass

import numpy as np

from ..core import expr as E
from ..core.cost import JoinWorkEstimator, NaiveEstimator
from ..core.mnc import MncEstimator
from ..core.rewriter import RewriteResult, hadad_rewrite
from ..core.views import View
from ..linalg.coo import CooMatrix, from_numpy
from ..linalg.executor import SparkExecutor
from . import datasets
from .expected import VIEWS_EXP


@dataclass
class TimedRun:
    pid: str
    q_exec: float
    rw_find: float
    rw_exec: float
    best: str
    cost_before: float
    cost_after: float
    rel_diff: float      # |original - rewritten| / scale, on the Spark outputs

    @property
    def speedup(self) -> float:
        return self.q_exec / max(self.rw_exec + self.rw_find, 1e-9)

    @property
    def overhead(self) -> float:
        """RW_find / (Q_exec + RW_find), §9.1.3's overhead metric."""
        return self.rw_find / max(self.q_exec + self.rw_find, 1e-12)


def _to_array(out) -> np.ndarray:
    if isinstance(out, CooMatrix):
        return out.to_numpy()
    return np.array([[float(out)]])


def make_env(spark, expr: E.Expr, views: tuple[View, ...] = (),
             seed: int = 0) -> dict[str, CooMatrix]:
    """Load base matrices of ``expr`` (and of the views) + materialize the
    views themselves, all as cached COO matrices."""
    leaves: dict[str, E.Mat] = dict(E.base_matrices(expr))
    for v in views:
        for n, m in E.base_matrices(v.expr).items():
            leaves.setdefault(n, m)
    mats = {n: datasets.material(m, seed) for n, m in leaves.items()}
    env = {n: from_numpy(spark, a).cached().materialize() for n, a in mats.items()}
    from ..core.npexec import eval_np
    for v in views:
        val = eval_np(v.expr, mats)
        arr = val if isinstance(val, np.ndarray) else np.array([[val]])
        env[v.name] = from_numpy(spark, arr).cached().materialize()
    return env


def mnc_estimator_for(expr: E.Expr, views: tuple[View, ...] = (),
                      seed: int = 0) -> MncEstimator:
    """MNC estimator with offline histograms of the base matrices."""
    est = MncEstimator()
    leaves = dict(E.base_matrices(expr))
    for v in views:
        leaves.update(E.base_matrices(v.expr))
    for n, m in leaves.items():
        est.register(n, datasets.material(m, seed))
    return est


def run_pipeline(spark, pid: str, expr: E.Expr, view_names: tuple[str, ...] = (),
                 estimator=None, env: dict | None = None,
                 check: bool = True, seed: int = 0) -> TimedRun:
    views = tuple(VIEWS_EXP[n] for n in view_names)
    env = env if env is not None else make_env(spark, expr, views, seed)
    # default to the COO-substrate-aware cost (join intermediates count);
    # pass NaiveEstimator()/MncEstimator() to reproduce the paper's models
    est = estimator or JoinWorkEstimator()

    t0 = time.perf_counter()
    out_o = SparkExecutor(spark, env).run(expr)
    q_exec = time.perf_counter() - t0

    rw: RewriteResult = hadad_rewrite(expr, views=views, estimator=est)

    t0 = time.perf_counter()
    out_r = SparkExecutor(spark, env).run(rw.best)
    rw_exec = time.perf_counter() - t0

    rel = 0.0
    if check:
        a, b = _to_array(out_o), _to_array(out_r)
        if a.shape != b.shape and a.size == 1 and b.size == 1:
            a, b = a.reshape(1, 1), b.reshape(1, 1)
        scale = max(1.0, float(np.abs(a).max()))
        rel = float(np.abs(a - b).max()) / scale
    return TimedRun(pid, q_exec, rw.rw_find_s, rw_exec, E.to_str(rw.best),
                    rw.cost_before, rw.cost_after, rel)
