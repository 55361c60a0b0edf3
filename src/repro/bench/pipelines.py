"""The 57-pipeline LA benchmark (paper Tables 2 and 3).

Matrix-name -> dataset bindings follow Table 6 at the scaled dimensions
of ``bench.datasets``. Two paper bindings are shape-inconsistent as
printed and are fixed here: ``v1`` in P2.21 must match D's side (the
paper binds v1 to Syn7=100x1 while D is 10Kx10K), and P2.25's vector is
``v2`` (Table 15's "v1" is a typo).
"""
from __future__ import annotations

from ..core.expr import (ConstS, Expr, Mat, colsums, det, inv, mat, mexp,
                         rowsums, trace, tsum)
from .datasets import SYN, REAL_LIKE

# ---------------------------------------------------------------------------
# Leaves (Table 6 bindings, scaled). Dense unless nnz is set.
# ---------------------------------------------------------------------------
A = mat("A", *SYN["Syn3"])
B = mat("B", *SYN["Syn3"])
C = mat("C", *SYN["Syn5"])
D = mat("D", *SYN["Syn5"])          # C and D must share a size (C+D, CD, ...)
M = mat("M", *SYN["Syn1"])
N = mat("N", *SYN["Syn2"])
R = mat("R", *SYN["Syn10"])
X = mat("X", REAL_LIKE["AL3"][0], REAL_LIKE["AL3"][1], nnz=REAL_LIKE["AL3"][2])
v1 = mat("v1", SYN["Syn1"][1], 1)   # right-multiplies A/B (cols(A) x 1)
v1d = mat("v1", SYN["Syn5"][0], 1)  # right-multiplies D in the OLS pipeline
u1 = mat("u1", X.r, 1)
v2 = mat("v2", X.c, 1)

#: sparse stand-ins used by the "ultra-sparse M" variations of §9.1.1
M_SPARSE = mat("M", M.r, M.c, nnz=REAL_LIKE["AS"][2])
A_SPARSE = mat("A", A.r, A.c, nnz=REAL_LIKE["AL1"][2])

s1 = ConstS(3.0)
s2 = ConstS(5.0)

# ---------------------------------------------------------------------------
# Table 2 — P1.*
# ---------------------------------------------------------------------------
P1: dict[str, Expr] = {
    "P1.1": (M @ N).T,
    "P1.2": A.T + B.T,
    "P1.3": inv(C) @ inv(D),
    "P1.4": (A + B) @ v1,
    "P1.5": inv(inv(D)),
    "P1.6": trace(s1 * D),
    "P1.7": A.T.T,
    "P1.8": s1 * A + s2 * A,
    "P1.9": det(D.T),
    "P1.10": rowsums(A.T),
    "P1.11": rowsums(A.T + B.T),
    "P1.12": colsums(M @ N),
    "P1.13": tsum(M @ N),
    "P1.14": tsum(colsums(N.T @ M.T)),
    "P1.15": (M @ N) @ M,
    "P1.16": tsum(A.T),
    "P1.17": det(C @ D @ C),
    "P1.18": tsum(colsums(A)),
    "P1.19": inv(C.T),
    "P1.20": trace(inv(C)),
    "P1.21": (C + inv(D)).T,
    "P1.22": trace(inv(C + D)),
    "P1.23": det(inv(C @ D) + D),
    "P1.24": trace(inv(C @ D)) + trace(D),
    "P1.25": M * (N.T / (M @ N @ N.T)),
    "P1.26": N * (M.T / (M.T @ M @ N)),
    "P1.27": trace(D @ (C @ D).T),
    "P1.28": A * (A * B + A),
    "P1.29": D @ C @ C @ C,
    "P1.30": (N @ M) * ((N @ M) @ R.T),
}

# ---------------------------------------------------------------------------
# Table 3 — P2.*
# ---------------------------------------------------------------------------
P2: dict[str, Expr] = {
    "P2.1": trace(C + D),
    "P2.2": det(inv(D)),
    "P2.3": trace(D.T),
    "P2.4": s1 * A + s1 * B,
    "P2.5": det(inv(C + D)),
    "P2.6": C.T @ inv(D.T),
    "P2.7": (D @ inv(D)) @ C,
    "P2.8": det(C.T @ D),
    "P2.9": trace(C.T @ D.T + D),
    "P2.10": rowsums(M @ N),
    "P2.11": tsum(A + B),
    "P2.12": tsum(rowsums(N.T @ M.T)),
    "P2.13": ((M @ N) @ M).T,
    "P2.14": ((M @ N) @ M) @ N,
    "P2.15": tsum(rowsums(A)),
    "P2.16": trace(inv(C) @ inv(D)) + trace(D),
    "P2.17": inv(C + D).T @ inv(inv(D)) @ inv(C) @ C,
    "P2.18": colsums(A.T + B.T),
    "P2.19": inv(C.T @ D),
    "P2.20": (M @ (N @ M)).T,
    "P2.21": inv(D.T @ D) @ (D.T @ v1d),
    "P2.22": mexp((C + D).T),
    "P2.23": det(C) * det(D) * det(C),
    "P2.24": (inv(D) @ C).T,
    "P2.25": (u1 @ v2.T - X) @ v2,
    "P2.26": mexp(inv(C + D)),
    "P2.27": (inv((C + D).T) @ D) @ C,
}

ALL: dict[str, Expr] = {**P1, **P2}

#: §9.1: the 38 pipelines improvable by LA properties alone (Tables 12-13)
P_NOOPT = [f"P1.{i}" for i in range(1, 19)] + ["P1.25"] \
    + [f"P2.{i}" for i in range(1, 19)] + ["P2.25"]
#: the 19 already-optimal pipelines (§9.1.3 overhead study)
P_OPT = [k for k in ALL if k not in P_NOOPT]
