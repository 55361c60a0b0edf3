"""Datasets of the evaluation (paper Tables 4-6), scaled for one node.

The paper's real sparse matrices (UFlorida collection, Amazon/Netflix
review matrices) are unavailable offline; we generate synthetic matrices
with the *same sparsity regimes* at ~1/50 linear scale (documented in
EXPERIMENTS.md). The speed-up shape is driven by intermediate-size
ratios (dense n^2 products vs thin vectors, ultra-sparse operands), all
of which survive this scaling.
"""
from __future__ import annotations

import numpy as np

from ..core.expr import Mat
from ..core.npexec import rand_for
from ..linalg.coo import CooMatrix, from_numpy

#: paper Table 5 (rows, cols) and our scaled stand-ins
SYN_PAPER = {
    "Syn1": (50_000, 100), "Syn2": (100, 50_000), "Syn3": (1_000_000, 100),
    "Syn4": (5_000_000, 100), "Syn5": (10_000, 10_000), "Syn6": (20_000, 20_000),
    "Syn7": (100, 1), "Syn8": (50_000, 1), "Syn9": (100_000, 1),
    "Syn10": (100, 100),
}
SYN = {
    "Syn1": (800, 25), "Syn2": (25, 800), "Syn3": (4000, 25),
    "Syn4": (8000, 25), "Syn5": (200, 200), "Syn6": (240, 240),
    "Syn7": (25, 1), "Syn8": (300, 1), "Syn9": (1200, 1), "Syn10": (25, 25),
}

#: paper Table 4: (rows, cols, nnz) — and scaled stand-ins keeping sparsity
REAL_PAPER = {
    "DFV": (1_000_000, 100, 8050), "2D_54019": (50_000, 100, 3700),
    "AS": (50_000, 100, 378), "AM": (100_000, 100, 673),
    "AL1": (1_000_000, 100, 6539), "AL2": (10_000_000, 100, 11897),
    "AL3": (100_000, 50_000, 103_557),
    "NS": (50_000, 100, 69_559), "NM": (100_000, 100, 139_344),
    "NL1": (1_000_000, 100, 665_445), "NL2": (10_000_000, 100, 665_445),
    "NL3": (100_000, 50_000, 15_357_418),
}


def _scaled_real() -> dict[str, tuple[int, int, int]]:
    out = {}
    for name, (r, c, nnz) in REAL_PAPER.items():
        density = nnz / (r * c)
        if c > 1000:   # the wide X-role matrices (AL3/NL3, 100K x 50K)
            sr, sc = r // 50, c // 100
        else:
            sr, sc = max(50, r // 1250), max(25, c // 100)
            sr, sc = min(sr, 8000), min(sc, 400)
        out[name] = (sr, sc, max(4, int(round(density * sr * sc))))
    return out


REAL_LIKE = _scaled_real()


def leaf(name: str, dataset: str) -> Mat:
    """A Mat leaf named ``name`` with the dims/nnz of ``dataset``."""
    if dataset in SYN:
        r, c = SYN[dataset]
        return Mat(name, r, c)
    r, c, nnz = REAL_LIKE[dataset]
    return Mat(name, r, c, nnz=nnz)


def material(m: Mat, seed: int = 0) -> np.ndarray:
    """Deterministic ndarray for a leaf (honours nnz / mtype)."""
    return rand_for(m, seed)


def spark_env(spark, leaves: dict[str, Mat], seed: int = 0) -> dict[str, CooMatrix]:
    """Load every leaf into a cached COO Spark matrix."""
    out = {}
    for name, m in leaves.items():
        out[name] = from_numpy(spark, material(m, seed)).cached().materialize()
    return out
