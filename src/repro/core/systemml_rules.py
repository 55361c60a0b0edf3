"""``MMC_StatAgg``: SystemML's algebraic-simplification rewrite rules
encoded as integrity constraints (paper §6.2.6, Appendix B Table 11).

Families: unnecessary aggregates, pushdownUnaryAggTransposeOp,
simplifyTraceMatrixMult, simplifySumMatrixMult, row/col-vector aggregate
no-ops, pushdownSumOnAdd.

Omission (documented): ``ColSumsMVMult`` (colSums(M*v) -> t(M)v and the
rowSums twin) relies on SystemML's vector-broadcast semantics for ``*``,
which our Hadamard product does not define; no benchmark pipeline uses it.
"""
from __future__ import annotations

from .constraints import A, Rule, col_vector, row_vector, same_shape, tgd
from .vrem import KIND_SUFFIX


def systemml_rules() -> list[Rule]:
    r: list[Rule] = []
    # ---- unnecessary aggregates ----
    r += tgd("sum_tr", [A("tr", "M", "R1"), A("sum", "R1", "s")],
             [A("sum", "M", "s")], bidir=True)
    for kind, suf in KIND_SUFFIX.items():
        if kind in ("sum", "min", "max"):
            # agg(rowAgg(M)) -> agg(M), agg(colAgg(M)) -> agg(M)
            r += tgd(f"{kind}_row{suf}",
                     [A(f"row{suf}", "M", "R1"), A(kind, "R1", "s")],
                     [A(kind, "M", "s")])
            r += tgd(f"{kind}_col{suf}",
                     [A(f"col{suf}", "M", "R1"), A(kind, "R1", "s")],
                     [A(kind, "M", "s")])
    # ---- pushdownUnaryAggTransposeOp: rowAgg(t(M)) = t(colAgg(M)) ----
    for kind, suf in KIND_SUFFIX.items():
        r += tgd(f"row{suf}_tr",
                 [A("tr", "M", "R1"), A(f"row{suf}", "R1", "R2")],
                 [A(f"col{suf}", "M", "R3"), A("tr", "R3", "R2")],
                 bidir=True)
        r += tgd(f"col{suf}_tr",
                 [A("tr", "M", "R1"), A(f"col{suf}", "R1", "R2")],
                 [A(f"row{suf}", "M", "R3"), A("tr", "R3", "R2")],
                 bidir=True)
    # ---- simplifyTraceMatrixMult: trace(MN) = sum(M * t(N)) ----
    r += tgd("trace_mm",
             [A("multi_M", "M", "N", "R1"), A("trace", "R1", "s")],
             [A("tr", "N", "R3"), A("multi_E", "M", "R3", "R4"),
              A("sum", "R4", "s")],
             bidir=True)
    # ---- simplifySumMatrixMult ----
    # sum(MN) = sum(t(colSums(M)) * rowSums(N))
    r += tgd("sum_mm",
             [A("multi_M", "M", "N", "R1"), A("sum", "R1", "s")],
             [A("colSums", "M", "R2"), A("tr", "R2", "R3"),
              A("rowSums", "N", "R4"), A("multi_E", "R3", "R4", "R5"),
              A("sum", "R5", "s")],
             bidir=True)
    # colSums(MN) = colSums(M) N
    r += tgd("colsums_mm",
             [A("multi_M", "M", "N", "R1"), A("colSums", "R1", "R2")],
             [A("colSums", "M", "R3"), A("multi_M", "R3", "N", "R2")],
             bidir=True)
    # rowSums(MN) = M rowSums(N)
    r += tgd("rowsums_mm",
             [A("multi_M", "M", "N", "R1"), A("rowSums", "R1", "R2")],
             [A("rowSums", "N", "R3"), A("multi_M", "M", "R3", "R2")],
             bidir=True)
    # ---- vector aggregate no-ops / degenerations ----
    from .constraints import egd  # local import keeps the header tidy
    for kind, suf in KIND_SUFFIX.items():
        # colAgg(M) -> M when M is a row vector; rowAgg(M) -> M when col vector
        r += egd(f"col{suf}_rowvec", [A(f"col{suf}", "M", "R")],
                 [("R", "M")], guard=row_vector("M"))
        r += egd(f"row{suf}_colvec", [A(f"row{suf}", "M", "R")],
                 [("R", "M")], guard=col_vector("M"))
        # colAgg(col-vector) -> full agg; rowAgg(row-vector) -> full agg
        r += tgd(f"col{suf}_colvec", [A(f"col{suf}", "M", "R1")],
                 [A(kind, "M", "R1")], guard=col_vector("M"))
        r += tgd(f"row{suf}_rowvec", [A(f"row{suf}", "M", "R1")],
                 [A(kind, "M", "R1")], guard=row_vector("M"))
    # ---- pushdownSumOnAdd: sum(M+N) = sum(M) + sum(N) ----
    r += tgd("sum_add",
             [A("add_M", "M", "N", "R1"), A("sum", "R1", "s1")],
             [A("sum", "M", "s2"), A("sum", "N", "s3"),
              A("add_S", "s2", "s3", "s1")],
             bidir=True, rev_guard=same_shape("M", "N"))
    return r
