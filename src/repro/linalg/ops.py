"""Distributed LA operators over COO DataFrames.

Each operator is a DataFrame -> DataFrame transformation, so a rewritten
expression compiles to a different Catalyst plan — this is where the
intermediate-size asymmetries that HADAD's cost model reasons about
become real shuffle/join sizes.

Zero-handling: implicit entries are zero. Aggregations (row/col/full
min, max, mean, var) account for the implicit zeros via the known
dimension counts; absent output rows/cols denote zero results, which is
exactly the sparse semantics the oracle SQL uses too.
"""
from __future__ import annotations

from pyspark.sql import functions as F

from .coo import CooMatrix


def _chk(cond: bool, msg: str) -> None:
    if not cond:
        raise ValueError(msg)


def _ab(a: CooMatrix, b: CooMatrix):
    fa = a.df.select(F.col("i").alias("ai"), F.col("j").alias("aj"),
                     F.col("v").alias("av"))
    fb = b.df.select(F.col("i").alias("bi"), F.col("j").alias("bj"),
                     F.col("v").alias("bv"))
    return fa, fb


def matmul(a: CooMatrix, b: CooMatrix) -> CooMatrix:
    """A @ B as join on the contraction index + group-by aggregation."""
    _chk(a.c == b.r, f"matmul {a.shape} @ {b.shape}")
    fa, fb = _ab(a, b)
    df = (fa.join(fb, fa.aj == fb.bi)
            .groupBy(F.col("ai").alias("i"), F.col("bj").alias("j"))
            .agg(F.sum(F.col("av") * F.col("bv")).alias("v")))
    return CooMatrix(df, a.r, b.c)


def add(a: CooMatrix, b: CooMatrix, alpha: float = 1.0, beta: float = 1.0) -> CooMatrix:
    """alpha*A + beta*B via union + group-by (outer-join semantics)."""
    _chk(a.shape == b.shape, f"add {a.shape} + {b.shape}")
    da = a.df.select("i", "j", (F.col("v") * F.lit(float(alpha))).alias("v"))
    db = b.df.select("i", "j", (F.col("v") * F.lit(float(beta))).alias("v"))
    df = (da.unionByName(db).groupBy("i", "j").agg(F.sum("v").alias("v"))
            .where(F.col("v") != 0.0))
    return CooMatrix(df, a.r, a.c)


def emul(a: CooMatrix, b: CooMatrix) -> CooMatrix:
    """Hadamard product: inner join on (i, j)."""
    _chk(a.shape == b.shape, f"emul {a.shape} * {b.shape}")
    fa, fb = _ab(a, b)
    df = (fa.join(fb, (fa.ai == fb.bi) & (fa.aj == fb.bj))
            .select(F.col("ai").alias("i"), F.col("aj").alias("j"),
                    (F.col("av") * F.col("bv")).alias("v")))
    return CooMatrix(df, a.r, a.c)


def ediv(a: CooMatrix, b: CooMatrix) -> CooMatrix:
    """Element-wise division; defined on A's support (0/x = 0; entries
    where B is zero would be inf and are assumed absent — the benchmark
    divisors are dense on A's support, as in the paper's P1.25/P1.26)."""
    _chk(a.shape == b.shape, f"ediv {a.shape} / {b.shape}")
    fa, fb = _ab(a, b)
    df = (fa.join(fb, (fa.ai == fb.bi) & (fa.aj == fb.bj))
            .select(F.col("ai").alias("i"), F.col("aj").alias("j"),
                    (F.col("av") / F.col("bv")).alias("v")))
    return CooMatrix(df, a.r, a.c)


def smul(c: float, a: CooMatrix) -> CooMatrix:
    if c == 0.0:
        return CooMatrix(a.df.where(F.lit(False)), a.r, a.c)
    return CooMatrix(a.df.select("i", "j", (F.col("v") * F.lit(float(c))).alias("v")),
                     a.r, a.c)


def transpose(a: CooMatrix) -> CooMatrix:
    return CooMatrix(a.df.select(F.col("j").alias("i"), F.col("i").alias("j"), "v"),
                     a.c, a.r)


def _agg_cols():
    """Aggregates needed to reconstruct min/max/mean/var with implicit zeros."""
    return [
        F.sum("v").alias("s"),
        F.sum(F.col("v") * F.col("v")).alias("ss"),
        F.min("v").alias("mn"),
        F.max("v").alias("mx"),
        F.count("v").alias("k"),
    ]


def _finish_agg(kind: str, n: int):
    """Column expression computing the aggregate over n cells from (s, ss,
    mn, mx, k) where n - k cells are implicit zeros."""
    s, ss, mn, mx, k = (F.col(x) for x in ("s", "ss", "mn", "mx", "k"))
    full = k >= F.lit(n)
    if kind == "sum":
        return s
    if kind == "mean":
        return s / F.lit(float(n))
    if kind == "min":
        return F.when(full, mn).otherwise(F.least(mn, F.lit(0.0)))
    if kind == "max":
        return F.when(full, mx).otherwise(F.greatest(mx, F.lit(0.0)))
    if kind == "var":
        mean = s / F.lit(float(n))
        return ss / F.lit(float(n)) - mean * mean
    raise ValueError(kind)


def rowagg(a: CooMatrix, kind: str = "sum") -> CooMatrix:
    df = (a.df.groupBy("i").agg(*_agg_cols())
          .select("i", F.lit(0).cast("long").alias("j"),
                  _finish_agg(kind, a.c).alias("v"))
          .where(F.col("v") != 0.0))
    return CooMatrix(df, a.r, 1)


def colagg(a: CooMatrix, kind: str = "sum") -> CooMatrix:
    df = (a.df.groupBy("j").agg(*_agg_cols())
          .select(F.lit(0).cast("long").alias("i"), "j",
                  _finish_agg(kind, a.r).alias("v"))
          .where(F.col("v") != 0.0))
    return CooMatrix(df, 1, a.c)


def full_agg(a: CooMatrix, kind: str = "sum") -> float:
    n = a.r * a.c
    row = a.df.agg(*_agg_cols()).collect()[0]
    s, ss, mn, mx, k = (row["s"] or 0.0), (row["ss"] or 0.0), row["mn"], row["mx"], row["k"]
    if kind == "sum":
        return float(s)
    if kind == "mean":
        return float(s) / n
    if kind == "min":
        m = mn if mn is not None else 0.0
        return float(m if k >= n else min(m, 0.0))
    if kind == "max":
        m = mx if mx is not None else 0.0
        return float(m if k >= n else max(m, 0.0))
    if kind == "var":
        mean = s / n
        return float(ss / n - mean * mean)
    raise ValueError(kind)


def trace(a: CooMatrix) -> float:
    _chk(a.r == a.c, f"trace of {a.shape}")
    row = a.df.where(F.col("i") == F.col("j")).agg(F.sum("v").alias("s")).collect()[0]
    return float(row["s"] or 0.0)


def diag(a: CooMatrix) -> CooMatrix:
    _chk(a.r == a.c, f"diag of {a.shape}")
    df = a.df.where(F.col("i") == F.col("j")).select(
        "i", F.lit(0).cast("long").alias("j"), "v")
    return CooMatrix(df, a.r, 1)


def cbind(a: CooMatrix, b: CooMatrix) -> CooMatrix:
    _chk(a.r == b.r, f"cbind {a.shape} | {b.shape}")
    shifted = b.df.select("i", (F.col("j") + F.lit(a.c)).alias("j"), "v")
    return CooMatrix(a.df.unionByName(shifted), a.r, a.c + b.c)


def dsum(a: CooMatrix, b: CooMatrix) -> CooMatrix:
    shifted = b.df.select((F.col("i") + F.lit(a.r)).alias("i"),
                          (F.col("j") + F.lit(a.c)).alias("j"), "v")
    return CooMatrix(a.df.unionByName(shifted), a.r + b.r, a.c + b.c)


def kron(a: CooMatrix, b: CooMatrix) -> CooMatrix:
    fa, fb = _ab(a, b)
    df = fa.crossJoin(fb).select(
        (F.col("ai") * F.lit(b.r) + F.col("bi")).alias("i"),
        (F.col("aj") * F.lit(b.c) + F.col("bj")).alias("j"),
        (F.col("av") * F.col("bv")).alias("v"))
    return CooMatrix(df, a.r * b.r, a.c * b.c)


def filter_values(a: CooMatrix, predicate) -> CooMatrix:
    """Keep entries whose value satisfies ``predicate`` (a Column function
    of F.col('v')) — the hybrid benchmark's filter-level selection on N."""
    return CooMatrix(a.df.where(predicate(F.col("v"))), a.r, a.c)
