"""Morpheus-style executor: evaluates LA expressions where some leaves
are NormalizedMatrix values, applying Morpheus' *own* pushdown rules
op-by-op (and nothing more — Morpheus has no algebraic rewriting of the
surrounding expression, which is exactly the gap HADAD fills in §9.2.1).

Operator dispatch:
  * matmul / rowSums / colSums / sum on a normalized leaf -> factorized
  * anything else touching a normalized leaf -> materialize M first
"""
from __future__ import annotations

from pyspark.sql import SparkSession

from ..core import expr as E
from ..linalg import ops
from ..linalg.coo import CooMatrix
from ..linalg.executor import SparkExecutor
from .normalized import NormalizedMatrix


class MorpheusExecutor(SparkExecutor):
    def __init__(self, spark: SparkSession, env: dict[str, object]):
        super().__init__(spark, env)  # values may be CooMatrix or NormalizedMatrix

    def _eval(self, e: E.Expr, ev):
        if isinstance(e, E.Mat):
            m = self.env[e.name]
            if m.shape != e.shape:
                raise ValueError(f"env[{e.name}] {m.shape} != expr {e.shape}")
            return m
        if isinstance(e, E.MatMul):
            a, b = ev(e.a), ev(e.b)
            if isinstance(a, NormalizedMatrix) and isinstance(b, CooMatrix):
                return a.rmul(b)
            if isinstance(b, NormalizedMatrix) and isinstance(a, CooMatrix):
                return b.lmul(a)
            return ops.matmul(self._mat(a), self._mat(b))
        if isinstance(e, E.RowAgg) and e.kind == "sum":
            a = ev(e.a)
            if isinstance(a, NormalizedMatrix):
                return a.rowsums()
            return ops.rowagg(a, "sum")
        if isinstance(e, E.ColAgg) and e.kind == "sum":
            a = ev(e.a)
            if isinstance(a, NormalizedMatrix):
                return a.colsums()
            return ops.colagg(a, "sum")
        if isinstance(e, E.Sum) and e.kind == "sum":
            a = ev(e.a)
            if isinstance(a, NormalizedMatrix):
                return a.total_sum()
            return ops.full_agg(a, "sum")
        # everything else: materialize normalized operands, defer to base
        return super()._eval(e, lambda x: self._mat(ev(x)))

    @staticmethod
    def _mat(x):
        return x.materialize() if isinstance(x, NormalizedMatrix) else x
