"""The paper's expected rewrites and view set (Appendix C: Tables 12, 13,
14, 15) plus the headline speed-up factors reported in §9 — the ground
truth the reproduction is diffed against in EXPERIMENTS.md.
"""
from __future__ import annotations

from ..core.cost import NaiveEstimator, expr_stats
from ..core.expr import (Expr, Mat, SAdd, SInvS, SMul, SMulS, colsums, det,
                         inv, mexp, rowsums, trace, tsum)
from ..core.views import View
from .pipelines import A, B, C, D, M, N, R, X, s1, s2, u1, v1, v1d, v2

# ---------------------------------------------------------------------------
# Table 12 — rewrites of P1.* (no views)
# ---------------------------------------------------------------------------
EXPECTED_NOVIEWS: dict[str, Expr] = {
    "P1.1": N.T @ M.T,
    "P1.2": (A + B).T,
    "P1.3": inv(D @ C),
    "P1.4": A @ v1 + B @ v1,
    "P1.5": D,
    "P1.6": SMulS(s1, trace(D)),
    "P1.7": A,
    "P1.8": SMul(SAdd(s1, s2), A),
    "P1.9": det(D),
    "P1.10": colsums(A).T,
    "P1.11": colsums(A + B).T,
    "P1.12": colsums(M) @ N,
    "P1.13": tsum(colsums(M).T * rowsums(N)),
    "P1.14": tsum(colsums(M).T * rowsums(N)),
    "P1.15": M @ (N @ M),
    "P1.16": tsum(A),
    "P1.17": det(C) * det(D) * det(C),
    "P1.18": tsum(A),
    "P1.25": M * (N.T / (M @ (N @ N.T))),
    # ---- Table 13 — rewrites of P2.* ----
    "P2.1": trace(C) + trace(D),
    "P2.2": SInvS(det(D)),
    "P2.3": trace(D),
    "P2.4": SMul(s1, A + B),
    "P2.5": SInvS(det(C + D)),
    "P2.6": (inv(D) @ C).T,
    "P2.7": C,
    "P2.8": det(C) * det(D),
    "P2.9": trace(D @ C) + trace(D),
    "P2.10": M @ rowsums(N),
    "P2.11": tsum(A) + tsum(B),
    "P2.12": tsum(colsums(M).T * rowsums(N)),
    "P2.13": (M @ (N @ M)).T,
    "P2.14": (M @ (N @ M)) @ N,
    "P2.15": tsum(A),
    "P2.16": trace(inv(D @ C)) + trace(D),
    "P2.17": inv(C + D).T @ D,
    "P2.18": rowsums(A + B).T,
    "P2.25": u1 @ (v2.T @ v2) - X @ v2,
}

# ---------------------------------------------------------------------------
# Table 14 — the view set V_exp
# ---------------------------------------------------------------------------
VIEWS_EXP: dict[str, View] = {
    "V1": View("V1", inv(D)),
    "V2": View("V2", inv(C.T)),
    "V3": View("V3", N @ M),
    "V4": View("V4", u1 @ v2.T),
    "V5": View("V5", D @ C),
    "V6": View("V6", A + B),
    "V7": View("V7", inv(C)),
    "V8": View("V8", C.T @ D),
    "V9": View("V9", inv(D + C)),
    "V10": View("V10", det(C @ D)),
    "V11": View("V11", det(D @ C)),
    "V12": View("V12", (D @ C).T),
}

_EST = NaiveEstimator()


def vmat(name: str) -> Mat:
    """Scan leaf for a Table-14 view (shape/nnz from its definition)."""
    st = expr_stats(VIEWS_EXP[name].expr, _EST)
    return Mat(name, st.r, st.c, nnz=int(round(st.nnz)))


_V1, _V2, _V3, _V4, _V5, _V6 = (vmat(f"V{i}") for i in range(1, 7))
_V7, _V8, _V9, _V10, _V11, _V12 = (vmat(f"V{i}") for i in range(7, 13))

# ---------------------------------------------------------------------------
# Table 15 — expected view-based rewrites. Keys name the pipeline; every
# rewrite may also use LA properties. V5CCC in P1.29 reads V5 @ C @ C
# (V5 = DC already absorbs one C); Table 15's P2.25 "v1" is v2.
# ---------------------------------------------------------------------------
EXPECTED_VIEWS: dict[str, Expr] = {
    "P1.2": _V6.T,
    "P1.3": _V7 @ _V1,
    "P1.4": _V6 @ v1,
    "P1.11": colsums(_V6).T,
    "P1.15": M @ _V3,
    "P1.17": SMulS(_V10, det(C)),
    "P1.19": _V2,
    "P1.20": trace(_V7),
    "P1.21": (C + _V1).T,
    "P1.22": trace(_V9),
    # Table 15 prints "det((V7V1)+D)", but inv(CD) = D^-1 C^-1 = V1 V7;
    # the engine (correctly) refuses to prove the misordered product equal.
    "P1.23": det(_V1 @ _V7 + D),
    "P1.24": trace(_V1 @ _V7) + trace(D),
    "P1.29": _V5 @ C @ C,
    "P1.30": _V3 * (_V3 @ R.T),
    "P2.2": det(_V1),
    "P2.4": SMul(s1, _V6),
    "P2.5": det(_V9),
    "P2.6": (_V1 @ C).T,
    "P2.9": trace(_V12) + trace(D),
    "P2.11": tsum(_V6),
    "P2.13": (M @ _V3).T,
    "P2.14": M @ _V3 @ N,
    "P2.16": trace(_V7 @ _V1) + trace(D),
    "P2.17": _V9.T @ D,
    "P2.18": rowsums(_V6).T,
    "P2.20": (M @ _V3).T,
    "P2.21": _V1 @ (_V1.T @ (D.T @ v1d)),
    "P2.25": _V4 @ v2 - X @ v2,
    "P2.26": mexp(_V9),
    "P2.27": _V9.T @ _V5,
}

def _views_used(expr: Expr) -> tuple[str, ...]:
    from ..core.expr import walk
    return tuple(sorted({n.name for n in walk(expr)
                         if isinstance(n, Mat) and n.name in VIEWS_EXP}))


#: which views each pipeline's expected rewrite uses (for the rewriter call)
VIEWS_FOR: dict[str, tuple[str, ...]] = {
    pid: _views_used(expr) for pid, expr in EXPECTED_VIEWS.items()
}

# ---------------------------------------------------------------------------
# Headline speed-ups the paper reports (figures + text, §9) — recorded so
# EXPERIMENTS.md can show paper-vs-measured side by side.
# ---------------------------------------------------------------------------
PAPER_SPEEDUPS = {
    # §9.1.1 (no views; ranges over R/NumPy/TF/SystemML/MLlib)
    "P1.1": "1.3-4x", "P1.3": "~2x (TF ~1x)", "P1.4": "up to 9x",
    "P1.13": "50x", "P1.14": "up to 42x", "P2.12": "up to 42x",
    "P1.15": "large (chain order)", "P1.5": "~1000x",
    "noviews_dist": "87% of <10x group >=1.5x; 13 pipelines 10-60x",
    # §9.1.2 (views)
    "P2.14": "up to 2.8x", "P2.21": "70x R / 55x NumPy / 150x MLlib",
    "P2.25": "65x SystemML", "P2.27": "4-41x",
    # §9.2.1 (Morpheus)
    "P1.12": "up to 125x", "P2.10": "up to 15x", "P2.11": "up to 20x",
    "P2.15": "up to 4.5x",
    # §9.2.2 (hybrid micro-benchmark, Twitter)
    "Q1": "16.5x", "Q2": "2.5x", "Q3": "9.2x", "Q4": "3.63x", "Q5": "2.3x",
    "Q6": "13.4x", "Q8": "5.94x", "Q9": "3x", "Q10": "3.91x",
}
