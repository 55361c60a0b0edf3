"""Driver-side (numpy) operators for LA operations with no scalable COO
formulation: inverse, determinant, matrix exponential, adjugate and
decompositions.

This mirrors SystemML's CP (single-node control program) operators: the
matrix is collected to the driver, the dense kernel runs in numpy, and
the result is re-parallelized. A size guard keeps collections bounded.
"""
from __future__ import annotations

import numpy as np
from pyspark.sql import SparkSession

from ..core import npexec
from .coo import CooMatrix, from_numpy

#: refuse to collect matrices beyond this many cells to the driver
LOCAL_MAX_CELLS = 16_000_000


def _collect(a: CooMatrix) -> np.ndarray:
    if a.r * a.c > LOCAL_MAX_CELLS:
        raise ValueError(
            f"matrix {a.shape} too large for a driver-side (CP) operator; "
            f"limit is {LOCAL_MAX_CELLS} cells")
    return a.to_numpy()


def _spark(a: CooMatrix) -> SparkSession:
    return a.df.sparkSession


def inverse(a: CooMatrix) -> CooMatrix:
    return from_numpy(_spark(a), np.linalg.inv(_collect(a)))


def determinant(a: CooMatrix) -> float:
    return float(np.linalg.det(_collect(a)))


def expm(a: CooMatrix) -> CooMatrix:
    return from_numpy(_spark(a), npexec._expm(_collect(a)))


def adjugate(a: CooMatrix) -> CooMatrix:
    m = _collect(a)
    return from_numpy(_spark(a), np.linalg.det(m) * np.linalg.inv(m))


def cholesky(a: CooMatrix) -> CooMatrix:
    return from_numpy(_spark(a), np.linalg.cholesky(_collect(a)))


def qr_factor(a: CooMatrix, part: str) -> CooMatrix:
    q, r = np.linalg.qr(_collect(a))
    return from_numpy(_spark(a), q if part == "Q" else r)


def lu_factor(a: CooMatrix, part: str) -> CooMatrix:
    l_, u = npexec._lu_nopivot(_collect(a))
    return from_numpy(_spark(a), l_ if part == "L" else u)


def lup_factor(a: CooMatrix, part: str) -> CooMatrix:
    l_, u, p = npexec._lup(_collect(a))
    return from_numpy(_spark(a), {"L": l_, "U": u, "P": p}[part])
