"""MNC (Matrix Non-zero Count) sparsity estimator (§7.2.2, [46]).

Keeps per-class row/column non-zero-count histograms ``hr``/``hc``.
Base-matrix histograms are computed offline (``mnc_from_numpy`` /
``register``); histograms of intermediates are *derived online* during
cost estimation — the overhead the paper measures in §9.1.3.

Simplifications vs [46] (documented): no per-entry extended histograms;
product derivation uses the count-product upper bound with density
scaling for derived histograms. The estimator is exact on structured
cases (diagonal/permutation-like operands) and validated for
boundedness/monotonicity in tests.
"""
from __future__ import annotations

import numpy as np

from . import expr as E
from .cost import MatStats, NaiveEstimator


def mnc_from_numpy(a: np.ndarray) -> tuple[np.ndarray, np.ndarray]:
    nz = a != 0
    return nz.sum(axis=1).astype(float), nz.sum(axis=0).astype(float)


def _ensure(s: MatStats) -> MatStats:
    """Synthesize uniform histograms when none are attached."""
    if s.hr is not None and s.hc is not None:
        return s
    hr = np.full(s.r, min(s.c, s.nnz / max(1, s.r)), dtype=float)
    hc = np.full(s.c, min(s.r, s.nnz / max(1, s.c)), dtype=float)
    return MatStats(s.r, s.c, s.nnz, hr, hc)


class MncEstimator(NaiveEstimator):
    name = "mnc"

    def __init__(self):
        self._hists: dict[str, tuple[np.ndarray, np.ndarray]] = {}

    def register(self, name: str, a: np.ndarray) -> None:
        """Record offline histograms for a base matrix."""
        self._hists[name] = mnc_from_numpy(a)

    def leaf(self, m: E.Mat) -> MatStats:
        s = super().leaf(m)
        h = self._hists.get(m.name)
        if h is not None:
            hr, hc = h
            return MatStats(s.r, s.c, float(hr.sum()), hr, hc)
        return _ensure(s)

    # -- derived histograms -------------------------------------------------
    def matmul(self, a: MatStats, b: MatStats) -> MatStats:
        a, b = _ensure(a), _ensure(b)
        r, c = a.r, b.c
        terms = float(np.dot(a.hc, b.hr))  # multiply-term count (MNC base)
        nnz = min(r * c, terms, a.nnz * c, b.nnz * r)
        row_density_b = b.nnz / max(1, b.r)
        hr = np.minimum(c, a.hr * row_density_b)
        col_density_a = a.nnz / max(1, a.c)
        hc = np.minimum(r, b.hc * col_density_a)
        return MatStats(r, c, nnz, hr, hc)

    def add(self, a: MatStats, b: MatStats) -> MatStats:
        a, b = _ensure(a), _ensure(b)
        hr = np.minimum(a.hr + b.hr, a.c)
        hc = np.minimum(a.hc + b.hc, a.r)
        return MatStats(a.r, a.c, float(hr.sum()), hr, hc)

    def emul(self, a: MatStats, b: MatStats) -> MatStats:
        a, b = _ensure(a), _ensure(b)
        hr = np.minimum(a.hr, b.hr)
        hc = np.minimum(a.hc, b.hc)
        return MatStats(a.r, a.c, float(hr.sum()), hr, hc)

    def rowagg(self, a: MatStats) -> MatStats:
        a = _ensure(a)
        nnz = float(np.count_nonzero(a.hr))
        return MatStats(a.r, 1, nnz, (a.hr > 0).astype(float), np.array([nnz]))

    def colagg(self, a: MatStats) -> MatStats:
        a = _ensure(a)
        nnz = float(np.count_nonzero(a.hc))
        return MatStats(1, a.c, nnz, np.array([nnz]), (a.hc > 0).astype(float))

    def dense_unary(self, a: MatStats) -> MatStats:
        return _ensure(MatStats(a.r, a.c, float(a.r * a.c)))
