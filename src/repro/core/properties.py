"""``MMC`` constraint library: LA properties as TGDs/EGDs.

``mmc_m_rules``        — structural key constraints (I_iden, I_zero; the
                         functional op keys like I_multi_M are enforced by
                         the store's functional index).
``la_property_rules``  — Appendix A, Tables 8–9 (addition, product,
                         transposition, inverse, determinant, adjoint,
                         trace, direct sum, exponential).
``decomposition_rules``— Table 10 (Cholesky, QR, LU, pivoted LU). These
                         are generative for every named square matrix, so
                         the rewriter only installs them when the query or
                         a view mentions a decomposition or a typed matrix.

Each equational rule here is validated numerically in
``tests/test_properties.py`` against the numpy executor.

Omission (documented): ``det(cM) = c^k det(M)`` needs the dimension k as
a runtime constant inside a conclusion atom, which the pattern language
does not express; no benchmark pipeline uses it.
"""
from __future__ import annotations

from .constraints import (A, Cst, Rule, all_guards, col_vector, egd, row_vector,
                          rows_eq, same_shape, square, tgd)


def mmc_m_rules() -> list[Rule]:
    return [
        *egd("I_iden", [A("Identity", "I1"), A("Identity", "I2")],
             [("I1", "I2")], guard=same_shape("I1", "I2")),
        *egd("I_zero", [A("Zero", "O1"), A("Zero", "O2")],
             [("O1", "O2")], guard=same_shape("O1", "O2")),
    ]


def la_property_rules() -> list[Rule]:
    r: list[Rule] = []
    # ---------------- addition ----------------
    r += tgd("add_comm",
             [A("add_M", "M", "N", "R")],
             [A("add_M", "N", "M", "R")])
    r += tgd("add_assoc",
             [A("add_M", "M", "N", "R1"), A("add_M", "R1", "D", "R2")],
             [A("add_M", "N", "D", "R3"), A("add_M", "M", "R3", "R2")],
             bidir=True)
    r += tgd("smul_dist_add",  # c(M+N) = cM + cN
             [A("add_M", "M", "N", "R1"), A("multi_MS", "c", "R1", "R2")],
             [A("multi_MS", "c", "M", "R3"), A("multi_MS", "c", "N", "R4"),
              A("add_M", "R3", "R4", "R2")],
             bidir=True)
    r += tgd("sadd_dist",  # (c+d)M = cM + dM
             [A("add_S", "c", "d", "s"), A("multi_MS", "s", "M", "R1")],
             [A("multi_MS", "c", "M", "R2"), A("multi_MS", "d", "M", "R3"),
              A("add_M", "R2", "R3", "R1")],
             bidir=True)
    r += egd("add_zero", [A("Zero", "O"), A("add_M", "M", "O", "R")],
             [("R", "M")])
    # ---------------- product ----------------
    r += tgd("mul_assoc",
             [A("multi_M", "M", "N", "R1"), A("multi_M", "R1", "D", "R2")],
             [A("multi_M", "N", "D", "R3"), A("multi_M", "M", "R3", "R2")],
             bidir=True)
    r += tgd("mul_ldist",  # M(N+D) = MN + MD
             [A("add_M", "N", "D", "R1"), A("multi_M", "M", "R1", "R2")],
             [A("multi_M", "M", "N", "R3"), A("multi_M", "M", "D", "R4"),
              A("add_M", "R3", "R4", "R2")],
             bidir=True)
    r += tgd("mul_rdist",  # (M+N)D = MD + ND
             [A("add_M", "M", "N", "R1"), A("multi_M", "R1", "D", "R2")],
             [A("multi_M", "M", "D", "R3"), A("multi_M", "N", "D", "R4"),
              A("add_M", "R3", "R4", "R2")],
             bidir=True)
    r += tgd("smul_pull_l",  # d(MN) = (dM)N
             [A("multi_M", "M", "N", "R1"), A("multi_MS", "d", "R1", "R2")],
             [A("multi_MS", "d", "M", "R3"), A("multi_M", "R3", "N", "R2")],
             bidir=True)
    r += tgd("smul_pull_r",  # M(dN) = d(MN)
             [A("multi_MS", "d", "N", "R3"), A("multi_M", "M", "R3", "R2")],
             [A("multi_M", "M", "N", "R1"), A("multi_MS", "d", "R1", "R2")],
             bidir=True)
    r += tgd("smul_smul",  # c(dM) = (cd)M
             [A("multi_MS", "d", "M", "R1"), A("multi_MS", "c", "R1", "R2")],
             [A("multi_S", "c", "d", "s"), A("multi_MS", "s", "M", "R2")],
             bidir=True)
    r += egd("smul_one", [A("multi_MS", 1.0, "M", "R")], [("R", "M")])
    r += egd("iden_mul_l", [A("Identity", "I"), A("multi_M", "I", "M", "R")],
             [("R", "M")])
    r += egd("iden_mul_r", [A("Identity", "I"), A("multi_M", "M", "I", "R")],
             [("R", "M")])
    r += tgd("zero_mul_l", [A("Zero", "O"), A("multi_M", "O", "M", "R")],
             [A("Zero", "R")])
    r += tgd("zero_mul_r", [A("Zero", "O"), A("multi_M", "M", "O", "R")],
             [A("Zero", "R")])
    # ---------------- transposition ----------------
    r += tgd("tr_mul",  # (MN)^T = N^T M^T
             [A("multi_M", "M", "N", "R1"), A("tr", "R1", "R2")],
             [A("tr", "M", "R3"), A("tr", "N", "R4"),
              A("multi_M", "R4", "R3", "R2")],
             bidir=True)
    r += tgd("tr_add",  # (M+N)^T = M^T + N^T
             [A("add_M", "M", "N", "R1"), A("tr", "R1", "R2")],
             [A("tr", "M", "R3"), A("tr", "N", "R4"),
              A("add_M", "R3", "R4", "R2")],
             bidir=True)
    r += tgd("tr_smul",  # (cM)^T = c M^T
             [A("multi_MS", "c", "M", "R1"), A("tr", "R1", "R2")],
             [A("tr", "M", "R3"), A("multi_MS", "c", "R3", "R2")],
             bidir=True)
    r += egd("tr_invol", [A("tr", "M", "R1"), A("tr", "R1", "R2")],
             [("R2", "M")])
    r += tgd("tr_iden", [A("Identity", "I")], [A("tr", "I", "I")])
    r += tgd("tr_zero", [A("Zero", "O")], [A("tr", "O", "O")],
             guard=square("O"))
    # ---------------- inverse ----------------
    r += egd("inv_invol", [A("inv_M", "M", "R1"), A("inv_M", "R1", "R2")],
             [("R2", "M")])
    r += tgd("inv_mul",  # (MN)^-1 = N^-1 M^-1
             [A("multi_M", "M", "N", "R1"), A("inv_M", "R1", "R2")],
             [A("inv_M", "M", "R3"), A("inv_M", "N", "R4"),
              A("multi_M", "R4", "R3", "R2")],
             guard=square("M"), bidir=True)
    r += tgd("inv_tr",  # (M^T)^-1 = (M^-1)^T
             [A("tr", "M", "R1"), A("inv_M", "R1", "R2")],
             [A("inv_M", "M", "R3"), A("tr", "R3", "R2")],
             bidir=True)
    r += tgd("inv_smul",  # (kM)^-1 = k^-1 M^-1
             [A("multi_MS", "k", "M", "R1"), A("inv_M", "R1", "R2")],
             [A("inv_S", "k", "s"), A("inv_M", "M", "R3"),
              A("multi_MS", "s", "R3", "R2")],
             bidir=True)
    r += tgd("inv_cancel_l", [A("inv_M", "M", "R1"), A("multi_M", "R1", "M", "R2")],
             [A("Identity", "R2")])
    r += tgd("inv_cancel_r", [A("inv_M", "M", "R1"), A("multi_M", "M", "R1", "R2")],
             [A("Identity", "R2")])
    r += tgd("inv_iden", [A("Identity", "I")], [A("inv_M", "I", "I")])
    # ---------------- determinant ----------------
    r += tgd("det_mul",  # det(MN) = det(M) det(N)
             [A("multi_M", "M", "N", "R1"), A("det", "R1", "d")],
             [A("det", "M", "d1"), A("det", "N", "d2"),
              A("multi_S", "d1", "d2", "d")],
             guard=square("M"), bidir=True, rev_guard=same_shape("M", "N"))
    r += tgd("det_tr", [A("tr", "M", "R1"), A("det", "R1", "d")],
             [A("det", "M", "d")], bidir=True)
    r += tgd("det_inv",  # det(M^-1) = det(M)^-1
             [A("inv_M", "M", "R1"), A("det", "R1", "d")],
             [A("det", "M", "d1"), A("inv_S", "d1", "d")],
             bidir=True)
    r += egd("det_iden", [A("Identity", "I"), A("det", "I", "d")],
             [("d", 1.0)])
    # ---------------- adjoint ----------------
    r += tgd("adj_tr", [A("adj", "M", "R1"), A("tr", "R1", "R2")],
             [A("tr", "M", "R3"), A("adj", "R3", "R2")], bidir=True)
    r += tgd("adj_inv", [A("adj", "M", "R1"), A("inv_M", "R1", "R2")],
             [A("inv_M", "M", "R3"), A("adj", "R3", "R2")], bidir=True)
    r += tgd("adj_mul",  # adj(MN) = adj(N) adj(M)
             [A("multi_M", "M", "N", "R1"), A("adj", "R1", "R2")],
             [A("adj", "N", "R3"), A("adj", "M", "R4"),
              A("multi_M", "R3", "R4", "R2")],
             bidir=True)
    # ---------------- trace ----------------
    r += tgd("trace_add",
             [A("add_M", "M", "N", "R1"), A("trace", "R1", "s1")],
             [A("trace", "M", "s2"), A("trace", "N", "s3"),
              A("add_S", "s2", "s3", "s1")],
             bidir=True, rev_guard=same_shape("M", "N"))
    r += tgd("trace_cyc", [A("multi_M", "M", "N", "R1"), A("trace", "R1", "s")],
             [A("multi_M", "N", "M", "R2"), A("trace", "R2", "s")])
    r += tgd("trace_tr", [A("tr", "M", "R1"), A("trace", "R1", "s")],
             [A("trace", "M", "s")], bidir=True)
    r += tgd("trace_smul",
             [A("multi_MS", "c", "M", "R1"), A("trace", "R1", "s1")],
             [A("trace", "M", "s2"), A("multi_S", "c", "s2", "s1")],
             bidir=True)
    # ---------------- direct sum ----------------
    r += tgd("dsum_add",  # (M⊕N) + (C⊕D) = (M+C) ⊕ (N+D)
             [A("sum_D", "M", "N", "R1"), A("sum_D", "C", "D", "R2"),
              A("add_M", "R1", "R2", "R3")],
             [A("add_M", "M", "C", "R4"), A("add_M", "N", "D", "R5"),
              A("sum_D", "R4", "R5", "R3")],
             bidir=True)
    r += tgd("dsum_mul",  # (M⊕N)(C⊕D) = (MC) ⊕ (ND)
             [A("sum_D", "M", "N", "R1"), A("sum_D", "C", "D", "R2"),
              A("multi_M", "R1", "R2", "R3")],
             [A("multi_M", "M", "C", "R4"), A("multi_M", "N", "D", "R5"),
              A("sum_D", "R4", "R5", "R3")],
             bidir=True)
    # ---------------- exponential ----------------
    r += tgd("exp_zero", [A("Zero", "O"), A("exp", "O", "R1")],
             [A("Identity", "R1")])
    r += tgd("exp_tr",  # exp(M^T) = exp(M)^T
             [A("tr", "M", "R1"), A("exp", "R1", "R2")],
             [A("exp", "M", "R3"), A("tr", "R3", "R2")],
             bidir=True)
    return r


def decomposition_rules() -> list[Rule]:
    r: list[Rule] = []
    # Cholesky: M symmetric positive definite => M = L L^T, L lower triangular
    r += tgd("cho_prop", [A("type", "M", Cst("S"))],
             [A("cho", "M", "L1"), A("type", "L1", Cst("L")),
              A("tr", "L1", "L2"), A("multi_M", "L1", "L2", "M")])
    # QR: any (square) named matrix M = QR, Q orthogonal, R upper
    r += tgd("qr_prop", [A("name", "M", "n")],
             [A("QR", "M", "Q", "R"), A("type", "Q", Cst("O")), A("type", "R", Cst("U")),
              A("multi_M", "Q", "R", "M")],
             guard=square("M"))
    r += tgd("qr_orth", [A("type", "Q", Cst("O"))],
             [A("QR", "Q", "Q", "I"), A("Identity", "I"),
              A("multi_M", "Q", "I", "Q")])
    r += tgd("qr_upper", [A("type", "R", Cst("U"))],
             [A("QR", "R", "I", "R"), A("Identity", "I"),
              A("multi_M", "I", "R", "R")],
             guard=square("R"))
    r += tgd("qr_iden", [A("Identity", "I")], [A("QR", "I", "I", "I")])
    # LU
    r += tgd("lu_prop", [A("name", "M", "n")],
             [A("LU", "M", "L", "U"), A("type", "L", Cst("L")), A("type", "U", Cst("U")),
              A("multi_M", "L", "U", "M")],
             guard=square("M"))
    r += tgd("lu_lower", [A("type", "L", Cst("L"))],
             [A("LU", "L", "L", "I"), A("Identity", "I"),
              A("multi_M", "L", "I", "L")],
             guard=square("L"))
    r += tgd("lu_upper", [A("type", "U", Cst("U"))],
             [A("LU", "U", "I", "U"), A("Identity", "I"),
              A("multi_M", "I", "U", "U")],
             guard=square("U"))
    r += tgd("lu_iden", [A("Identity", "I")], [A("LU", "I", "I", "I")])
    # pivoted LU: P M = L U
    r += tgd("lup_prop", [A("name", "M", "n")],
             [A("LUP", "M", "L", "U", "P"), A("type", "L", Cst("L")),
              A("type", "U", Cst("U")), A("type", "P", Cst("P")),
              A("multi_M", "L", "U", "R0"), A("multi_M", "P", "M", "R0")],
             guard=square("M"))
    return r
