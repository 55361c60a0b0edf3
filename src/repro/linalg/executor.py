"""Evaluate LA expressions over COO Spark matrices, *as stated*.

The executor follows the expression syntax exactly (no rewriting of its
own) so that ``Q_exec`` vs ``RW_exec`` timings compare the paper's
"original pipeline" against the HADAD rewriting on the same substrate.
Repeated subexpressions share one DataFrame lineage (memoized), and
scalar subexpressions evaluate eagerly to python floats.
"""
from __future__ import annotations

from pyspark.sql import SparkSession

from ..core import expr as E
from . import local, ops
from .coo import CooMatrix, identity, empty


def as_float(x) -> float:
    """Scalar coercion: §3 treats numbers as degenerate 1x1 matrices, so a
    1x1 CooMatrix appearing in a scalar position collapses to its value."""
    if isinstance(x, CooMatrix):
        if x.shape != (1, 1):
            raise ValueError(f"expected scalar, got matrix {x.shape}")
        rows = x.df.collect()
        return float(rows[0]["v"]) if rows else 0.0
    return float(x)


class SparkExecutor:
    def __init__(self, spark: SparkSession, env: dict[str, CooMatrix]):
        self.spark = spark
        self.env = env

    def eval(self, e: E.Expr, memo: dict | None = None):
        """Returns a CooMatrix for matrix nodes, a float for scalar nodes."""
        memo = {} if memo is None else memo
        if e in memo:
            return memo[e]
        ev = lambda x: self.eval(x, memo)  # noqa: E731
        out = self._eval(e, ev)
        memo[e] = out
        return out

    def _m(self, v):
        """Coerce a scalar result to a 1x1 CooMatrix (scalars are degenerate
        1x1 matrices, §3)."""
        if isinstance(v, CooMatrix):
            return v
        import numpy as np
        from .coo import from_numpy
        return from_numpy(self.spark, np.array([[float(v)]]))

    def _eval(self, e: E.Expr, ev):
        em = lambda x: self._m(ev(x))  # noqa: E731
        if isinstance(e, E.Mat):
            m = self.env[e.name]
            if m.shape != e.shape:
                raise ValueError(f"env[{e.name}] {m.shape} != expr {e.shape}")
            return m
        if isinstance(e, E.Ident):
            return identity(self.spark, e.k)
        if isinstance(e, E.ZeroM):
            return empty(self.spark, e.r, e.c)
        if isinstance(e, E.ConstS):
            return float(e.value)
        if isinstance(e, E.MatMul):
            return ops.matmul(em(e.a), em(e.b))
        if isinstance(e, E.MAdd):
            return ops.add(em(e.a), em(e.b))
        if isinstance(e, E.EMul):
            return ops.emul(em(e.a), em(e.b))
        if isinstance(e, E.EDiv):
            return ops.ediv(em(e.a), em(e.b))
        if isinstance(e, E.SMul):
            return ops.smul(as_float(ev(e.s)), em(e.a))
        if isinstance(e, E.Tr):
            return ops.transpose(em(e.a))
        if isinstance(e, E.Inv):
            return local.inverse(em(e.a))
        if isinstance(e, E.MExp):
            return local.expm(em(e.a))
        if isinstance(e, E.Adj):
            return local.adjugate(em(e.a))
        if isinstance(e, E.Diag):
            return ops.diag(em(e.a))
        if isinstance(e, E.RowAgg):
            return ops.rowagg(em(e.a), e.kind)
        if isinstance(e, E.ColAgg):
            return ops.colagg(em(e.a), e.kind)
        if isinstance(e, E.Det):
            return local.determinant(em(e.a))
        if isinstance(e, E.Trace):
            return ops.trace(em(e.a))
        if isinstance(e, E.Sum):
            return ops.full_agg(em(e.a), e.kind)
        if isinstance(e, E.SAdd):
            return as_float(ev(e.a)) + as_float(ev(e.b))
        if isinstance(e, E.SMulS):
            return as_float(ev(e.a)) * as_float(ev(e.b))
        if isinstance(e, E.SInvS):
            return 1.0 / as_float(ev(e.a))
        if isinstance(e, E.SPow):
            return as_float(ev(e.a)) ** e.k
        if isinstance(e, E.CBind):
            return ops.cbind(em(e.a), em(e.b))
        if isinstance(e, E.SumD):
            return ops.dsum(em(e.a), em(e.b))
        if isinstance(e, E.ProdD):
            return ops.kron(em(e.a), em(e.b))
        if isinstance(e, E.Cho):
            return local.cholesky(em(e.a))
        if isinstance(e, E.QrF):
            return local.qr_factor(em(e.a), e.part)
        if isinstance(e, E.LuF):
            return local.lu_factor(em(e.a), e.part)
        if isinstance(e, E.LupF):
            return local.lup_factor(em(e.a), e.part)
        raise TypeError(f"cannot execute {type(e)}")

    def run(self, e: E.Expr):
        """Evaluate and force computation; returns float or materialized CooMatrix."""
        out = self.eval(e)
        if isinstance(out, CooMatrix):
            out.materialize()
        return out
