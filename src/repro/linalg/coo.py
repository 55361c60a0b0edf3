"""COO matrix wrapper over a Spark DataFrame.

Schema: ``i`` (long, row), ``j`` (long, col), ``v`` (double). Implicit
entries are zero — the natural sparse representation, and the one whose
stored size the paper's cost model γ measures.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F
from pyspark.sql import types as T

COO_SCHEMA = T.StructType([
    T.StructField("i", T.LongType(), False),
    T.StructField("j", T.LongType(), False),
    T.StructField("v", T.DoubleType(), False),
])


@dataclass(frozen=True)
class CooMatrix:
    df: DataFrame
    r: int
    c: int

    @property
    def shape(self) -> tuple[int, int]:
        return (self.r, self.c)

    def nnz(self) -> int:
        return self.df.count()

    def to_numpy(self) -> np.ndarray:
        pdf = self.df.toPandas()
        out = np.zeros((self.r, self.c))
        if len(pdf):
            out[pdf["i"].to_numpy(), pdf["j"].to_numpy()] = pdf["v"].to_numpy()
        return out

    def cached(self) -> "CooMatrix":
        return CooMatrix(self.df.cache(), self.r, self.c)

    def materialize(self) -> "CooMatrix":
        """Force computation (used by the timing harness)."""
        self.df.count()
        return self


def from_numpy(spark: SparkSession, a: np.ndarray) -> CooMatrix:
    a = np.asarray(a, dtype=float)
    if a.ndim == 1:
        a = a.reshape(-1, 1)
    ii, jj = np.nonzero(a)
    pdf = pd.DataFrame({"i": ii.astype("int64"), "j": jj.astype("int64"),
                        "v": a[ii, jj].astype("float64")})
    df = spark.createDataFrame(pdf, schema=COO_SCHEMA)
    return CooMatrix(df, a.shape[0], a.shape[1])


def from_pandas_coo(spark: SparkSession, pdf: pd.DataFrame, r: int, c: int) -> CooMatrix:
    df = spark.createDataFrame(pdf[["i", "j", "v"]].astype(
        {"i": "int64", "j": "int64", "v": "float64"}), schema=COO_SCHEMA)
    return CooMatrix(df, r, c)


def empty(spark: SparkSession, r: int, c: int) -> CooMatrix:
    return CooMatrix(spark.createDataFrame([], schema=COO_SCHEMA), r, c)


def identity(spark: SparkSession, k: int) -> CooMatrix:
    df = spark.range(k).select(
        F.col("id").alias("i"), F.col("id").alias("j"), F.lit(1.0).alias("v"))
    return CooMatrix(df, k, k)
