"""Shared LHS ≡ RHS pairs for the constraint library: every pair is
(1) validated numerically against the numpy executor and
(2) proven equivalent by the chase engine.
"""
from __future__ import annotations

from repro.core import expr as E
from repro.core.expr import (ConstS, Ident, SAdd, SInvS, SMul, SMulS, ZeroM,
                             adj, cho, colsums, det, dsum, inv, mat, mexp, qr,
                             rowsums, trace, tsum)

A = mat("A", 6, 6)
B = mat("B", 6, 6)
C = mat("C", 6, 6)
D = mat("D", 6, 6)
R43 = mat("R", 4, 3)
S43 = mat("S43", 4, 3)
T34 = mat("T", 3, 4)
c, d = ConstS(2.5), ConstS(-1.5)

#: (id, lhs, rhs) — MMC_LAprop (Appendix A, Tables 8-9)
LA_PAIRS = [
    ("add_comm", A + B, B + A),
    ("add_assoc", (A + B) + C, A + (B + C)),
    ("smul_dist_add", c * (A + B), c * A + c * B),
    ("sadd_dist", SMul(SAdd(c, d), A), c * A + d * A),
    ("add_zero", A + ZeroM(6, 6), A),
    ("mul_assoc", (R43 @ T34) @ R43, R43 @ (T34 @ R43)),
    ("mul_ldist", A @ (B + C), A @ B + A @ C),
    ("mul_rdist", (A + B) @ C, A @ C + B @ C),
    ("smul_pull_l", c * (A @ B), (c * A) @ B),
    ("smul_pull_r", A @ (c * B), c * (A @ B)),
    ("smul_smul", c * (d * A), SMul(SMulS(c, d), A)),
    ("smul_one", ConstS(1.0) * A, A),
    ("iden_mul_l", Ident(6) @ A, A),
    ("iden_mul_r", A @ Ident(6), A),
    ("zero_mul_l", ZeroM(6, 6) @ A, ZeroM(6, 6)),
    ("tr_mul", (R43 @ T34).T, T34.T @ R43.T),
    ("tr_add", (A + B).T, A.T + B.T),
    ("tr_smul", (c * A).T, c * A.T),
    ("tr_invol", A.T.T, A),
    ("tr_iden", Ident(6).T, Ident(6)),
    ("inv_invol", inv(inv(C)), C),
    ("inv_mul", inv(C @ D), inv(D) @ inv(C)),
    ("inv_tr", inv(C.T), inv(C).T),
    ("inv_smul", inv(c * C), SMul(SInvS(c), inv(C))),
    ("inv_cancel_l", inv(C) @ C, Ident(6)),
    ("inv_cancel_r", C @ inv(C), Ident(6)),
    ("inv_iden", inv(Ident(6)), Ident(6)),
    ("det_mul", det(C @ D), det(C) * det(D)),
    ("det_tr", det(C.T), det(C)),
    ("det_inv", det(inv(C)), SInvS(det(C))),
    ("det_iden", det(Ident(6)), ConstS(1.0)),
    ("adj_tr", adj(C.T), adj(C).T),
    ("adj_inv", adj(inv(C)), inv(adj(C))),
    ("adj_mul", adj(C @ D), adj(D) @ adj(C)),
    ("trace_add", trace(A + B), trace(A) + trace(B)),
    ("trace_cyc", trace(R43 @ T34), trace(T34 @ R43)),
    ("trace_tr", trace(C.T), trace(C)),
    ("trace_smul", trace(c * C), SMulS(c, trace(C))),
    ("dsum_add", dsum(A, B) + dsum(C, D), dsum(A + C, B + D)),
    ("dsum_mul", dsum(A, B) @ dsum(C, D), dsum(A @ C, B @ D)),
    ("exp_zero", mexp(ZeroM(4, 4)), Ident(4)),
    ("exp_tr", mexp(C.T), mexp(C).T),
]

#: MMC_StatAgg (Appendix B, Table 11)
SYSML_PAIRS = [
    ("sum_tr", tsum(R43.T), tsum(R43)),
    ("sum_rowsums", tsum(rowsums(R43)), tsum(R43)),
    ("sum_colsums", tsum(colsums(R43)), tsum(R43)),
    ("min_rowmins", E.Sum(E.RowAgg("min", R43), "min"), E.Sum(R43, "min")),
    ("min_colmins", E.Sum(E.ColAgg("min", R43), "min"), E.Sum(R43, "min")),
    ("max_rowmaxs", E.Sum(E.RowAgg("max", R43), "max"), E.Sum(R43, "max")),
    ("max_colmaxs", E.Sum(E.ColAgg("max", R43), "max"), E.Sum(R43, "max")),
    *[(f"row{k}_tr", E.RowAgg(k, R43.T), E.ColAgg(k, R43).T)
      for k in ("sum", "min", "max", "mean", "var")],
    *[(f"col{k}_tr", E.ColAgg(k, R43.T), E.RowAgg(k, R43).T)
      for k in ("sum", "min", "max", "mean", "var")],
    ("trace_mm", trace(R43 @ T34), tsum(R43 * T34.T)),
    ("sum_mm", tsum(R43 @ T34), tsum(colsums(R43).T * rowsums(T34))),
    ("colsums_mm", colsums(R43 @ T34), colsums(R43) @ T34),
    ("rowsums_mm", rowsums(R43 @ T34), R43 @ rowsums(T34)),
    ("sum_add", tsum(A + B), tsum(A) + tsum(B)),
    ("colsums_rowvec", colsums(mat("r", 1, 5)), mat("r", 1, 5)),
    ("rowsums_colvec", rowsums(mat("q", 5, 1)), mat("q", 5, 1)),
    ("colsums_colvec", colsums(mat("q", 5, 1)), tsum(mat("q", 5, 1))),
    ("rowsums_rowvec", rowsums(mat("r", 1, 5)), tsum(mat("r", 1, 5))),
]

#: Morpheus/cbind factorization laws
SPD = mat("SPD", 5, 5, mtype="S")
CBIND_PAIRS = [
    ("cbind_colsums", colsums(E.CBind(R43, S43)),
     E.CBind(colsums(R43), colsums(S43))),
    ("cbind_rowsums", rowsums(E.CBind(R43, S43)),
     rowsums(R43) + rowsums(S43)),
    ("cbind_sum", tsum(E.CBind(R43, S43)), tsum(R43) + tsum(S43)),
    ("cbind_lmul", T34 @ E.CBind(R43, S43),
     E.CBind(T34 @ R43, T34 @ S43)),
]

#: decompositions (Table 10)
DECOMP_PAIRS = [
    ("cho_recompose", cho(SPD) @ cho(SPD).T, SPD),
    ("qr_recompose", qr(C, "Q") @ qr(C, "R"), C),
    ("lu_recompose", E.LuF(mat("DD", 5, 5, mtype="S"), "L")
     @ E.LuF(mat("DD", 5, 5, mtype="S"), "U"), mat("DD", 5, 5, mtype="S")),
]

ALL_ENGINE_PAIRS = LA_PAIRS + SYSML_PAIRS + CBIND_PAIRS
