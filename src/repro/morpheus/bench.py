"""§9.2.1 experiment: Morpheus alone vs Morpheus + HADAD rewrites on
synthetic PK-FK joins, sweeping the tuple ratio n_S/n_R (the paper fixes
n_R = 1M, d_S = 20 and varies tuple/feature ratios; we scale down)."""
from __future__ import annotations

import time
from dataclasses import dataclass

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession

from ..core import expr as E
from ..core.expr import colsums, mat, rowsums, tsum
from ..core.cost import JoinWorkEstimator
from ..core.rewriter import hadad_rewrite
from ..linalg.coo import CooMatrix, from_numpy, from_pandas_coo
from .executor import MorpheusExecutor
from .normalized import NormalizedMatrix


def gen_normalized(spark: SparkSession, *, n_r: int = 800, d_r: int = 20,
                   d_s: int = 10, tuple_ratio: int = 5,
                   seed: int = 0) -> NormalizedMatrix:
    g = np.random.default_rng(seed)
    n_s = n_r * tuple_ratio
    S = from_numpy(spark, g.random((n_s, d_s))).cached().materialize()
    R = from_numpy(spark, g.random((n_r, d_r))).cached().materialize()
    fk = g.integers(0, n_r, n_s)
    # K is the n_S x n_R FK indicator — built sparsely (one 1 per row)
    K = from_pandas_coo(
        spark, pd.DataFrame({"i": np.arange(n_s), "j": fk, "v": 1.0}),
        n_s, n_r).cached().materialize()
    return NormalizedMatrix(S, K, R)


def pipelines(nm: NormalizedMatrix) -> dict[str, E.Expr]:
    """The four §9.2.1 pipelines over the normalized matrix M (by name)."""
    n_s, d = nm.shape
    M = mat("M", n_s, d)
    Nx = mat("Nx", d, 25)          # P1.12's right operand
    Nl = mat("Nl", 25, n_s)        # P2.10's left operand
    Nb = mat("Nb", n_s, d)         # P2.11's dense addend
    return {
        "P1.12": colsums(M @ Nx),
        "P2.10": rowsums(Nl @ M),
        "P2.11": tsum(Nb + M),
        "P2.15": tsum(rowsums(M)),
    }


@dataclass
class MorpheusRun:
    pid: str
    tuple_ratio: int
    t_morpheus: float
    t_hadad: float
    rewrite: str
    rel_diff: float

    @property
    def speedup(self) -> float:
        return self.t_morpheus / max(self.t_hadad, 1e-9)


def run_one(spark: SparkSession, pid: str, nm: NormalizedMatrix,
            tuple_ratio: int, seed: int = 0, check: bool = True) -> MorpheusRun:
    expr = pipelines(nm)[pid]
    g = np.random.default_rng(seed + 1)
    env: dict[str, object] = {"M": nm}
    for name, leaf in E.base_matrices(expr).items():
        if name != "M":
            env[name] = from_numpy(spark, g.random(leaf.shape)).cached().materialize()

    def _run(e: E.Expr) -> tuple[float, object]:
        t0 = time.perf_counter()
        out = MorpheusExecutor(spark, env).run(e)
        return time.perf_counter() - t0, out

    t_m, out_m = _run(expr)                       # Morpheus alone
    # HADAD with the COO-substrate-aware cost (see JoinWorkEstimator)
    rw = hadad_rewrite(expr, estimator=JoinWorkEstimator())
    t_h, out_h = _run(rw.best)                    # Morpheus + HADAD rewrite

    rel = 0.0
    if check:
        a = out_m.to_numpy() if isinstance(out_m, CooMatrix) else np.array([[out_m]])
        b = out_h.to_numpy() if isinstance(out_h, CooMatrix) else np.array([[out_h]])
        rel = float(np.abs(a - b).max()) / max(1.0, float(np.abs(a).max()))
    return MorpheusRun(pid, tuple_ratio, t_m, t_h, E.to_str(rw.best), rel)
