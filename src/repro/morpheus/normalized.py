"""Normalized matrix + Morpheus' factorized operator pushdowns.

A PK-FK join of fact table S (n_S x d_S) with dimension table R
(n_R x d_R) through indicator matrix K (n_S x n_R, one 1 per row) yields
the materialized feature matrix

    M = [S, K R]        (n_S x (d_S + d_R), always dense)

Morpheus avoids materializing M by pushing operations to S, K, R:

    M N        = S N1 + K (R N2)          (N split by rows)
    C M        = [C S, (C K) R]
    rowSums(M) = rowSums(S) + K rowSums(R)
    colSums(M) = [colSums(S), colSums(K) R]
    sum(M)     = sum(S) + colSums(K) rowSums(R)
    agg(t(M))  = transposed twin of agg(M)

Element-wise ops (addition, Hadamard) are *not* factorized (paper §9.2.1,
P2.11) — Morpheus materializes M for those.
"""
from __future__ import annotations

from dataclasses import dataclass

from pyspark.sql import functions as F

from ..linalg import ops
from ..linalg.coo import CooMatrix


@dataclass(frozen=True)
class NormalizedMatrix:
    """M = [S, K @ R] held in factorized form."""

    S: CooMatrix
    K: CooMatrix
    R: CooMatrix

    def __post_init__(self):
        if self.S.r != self.K.r or self.K.c != self.R.r:
            raise ValueError(
                f"inconsistent normalized matrix: S{self.S.shape} K{self.K.shape} R{self.R.shape}")

    @property
    def shape(self) -> tuple[int, int]:
        return (self.S.r, self.S.c + self.R.c)

    @property
    def r(self) -> int:
        return self.shape[0]

    @property
    def c(self) -> int:
        return self.shape[1]

    # -- materialization (what Morpheus avoids) -----------------------------
    def materialize(self) -> CooMatrix:
        return ops.cbind(self.S, ops.matmul(self.K, self.R))

    # -- factorized pushdowns (Morpheus' own rewrite rules) ------------------
    def rmul(self, n: CooMatrix) -> CooMatrix:
        """M @ N with N split into the S-part rows and the R-part rows."""
        if n.r != self.c:
            raise ValueError(f"matmul {self.shape} @ {n.shape}")
        d_s = self.S.c
        n1 = CooMatrix(n.df.where(F.col("i") < d_s), d_s, n.c)
        n2 = CooMatrix(
            n.df.where(F.col("i") >= d_s)
            .select((F.col("i") - d_s).alias("i"), "j", "v"),
            self.R.c, n.c)
        return ops.add(ops.matmul(self.S, n1),
                       ops.matmul(self.K, ops.matmul(self.R, n2)))

    def lmul(self, c: CooMatrix) -> CooMatrix:
        """C @ M = [C S, (C K) R]."""
        if c.c != self.r:
            raise ValueError(f"matmul {c.shape} @ {self.shape}")
        return ops.cbind(ops.matmul(c, self.S),
                         ops.matmul(ops.matmul(c, self.K), self.R))

    def rowsums(self) -> CooMatrix:
        return ops.add(ops.rowagg(self.S),
                       ops.matmul(self.K, ops.rowagg(self.R)))

    def colsums(self) -> CooMatrix:
        return ops.cbind(ops.colagg(self.S),
                         ops.matmul(ops.colagg(self.K), self.R))

    def total_sum(self) -> float:
        kr = ops.matmul(ops.colagg(self.K), ops.rowagg(self.R))
        return ops.full_agg(self.S) + ops.full_agg(kr)
