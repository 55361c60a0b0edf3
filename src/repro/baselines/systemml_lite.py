"""SystemML-lite baseline: a *single bottom-up pass* of SystemML's static
algebraic-simplification rules over the AST (§6.2.6, Appendix B).

This is what "the platform alone" can do: each rule fires only when its
syntactic pattern is literally present — there is no closure over LA
properties, so e.g. ``sum(colSums(N^T M^T))`` (P1.14) is *not* reduced to
the cheap form because SystemML is unaware of ``(MN)^T = N^T M^T``
(paper §9.1.1). HADAD's rewrites must strictly subsume this baseline.
"""
from __future__ import annotations

from ..core import expr as E


def _rw(e: E.Expr) -> E.Expr:
    """One bottom-up pass: rewrite children first, then try each rule once."""
    # rebuild with rewritten children
    if isinstance(e, E.MatMul):
        e = _rw(e.a) @ _rw(e.b)
    elif isinstance(e, E.MAdd):
        e = E.MAdd(_rw(e.a), _rw(e.b))
    elif isinstance(e, E.EMul):
        e = E.EMul(_rw(e.a), _rw(e.b))
    elif isinstance(e, E.Tr):
        e = E.Tr(_rw(e.a))
    elif isinstance(e, E.RowAgg):
        e = E.RowAgg(e.kind, _rw(e.a))
    elif isinstance(e, E.ColAgg):
        e = E.ColAgg(e.kind, _rw(e.a))
    elif isinstance(e, E.Sum):
        e = E.Sum(_rw(e.a), e.kind)
    elif isinstance(e, E.Trace):
        e = E.Trace(_rw(e.a))
    elif e.children():
        # other operators: rewrite children generically where possible
        return e

    # ---- unnecessary aggregates ----
    if isinstance(e, E.Sum):
        a = e.a
        if isinstance(a, E.Tr) and e.kind == "sum":
            return E.Sum(a.a, "sum")
        if isinstance(a, (E.RowAgg, E.ColAgg)) and a.kind == e.kind \
                and e.kind in ("sum", "min", "max"):
            return E.Sum(a.a, e.kind)
        # pushdownSumOnAdd
        if isinstance(a, E.MAdd) and e.kind == "sum":
            return E.SAdd(E.Sum(a.a, "sum"), E.Sum(a.b, "sum"))
        # simplifySumMatrixMult: sum(MN) -> sum(t(colSums(M)) * rowSums(N))
        if isinstance(a, E.MatMul) and e.kind == "sum":
            return E.Sum(E.EMul(E.Tr(E.ColAgg("sum", a.a)),
                                E.RowAgg("sum", a.b)), "sum")
    # ---- trace(MN) -> sum(M * t(N)) ----
    if isinstance(e, E.Trace) and isinstance(e.a, E.MatMul):
        return E.Sum(E.EMul(e.a.a, E.Tr(e.a.b)), "sum")
    # ---- pushdownUnaryAggTransposeOp ----
    if isinstance(e, E.RowAgg) and isinstance(e.a, E.Tr):
        return E.Tr(E.ColAgg(e.kind, e.a.a))
    if isinstance(e, E.ColAgg) and isinstance(e.a, E.Tr):
        return E.Tr(E.RowAgg(e.kind, e.a.a))
    # ---- colSums(MN) -> colSums(M)N ; rowSums(MN) -> M rowSums(N) ----
    if isinstance(e, E.ColAgg) and e.kind == "sum" and isinstance(e.a, E.MatMul):
        return E.ColAgg("sum", e.a.a) @ e.a.b
    if isinstance(e, E.RowAgg) and e.kind == "sum" and isinstance(e.a, E.MatMul):
        return e.a.a @ E.RowAgg("sum", e.a.b)
    # ---- vector aggregates ----
    if isinstance(e, E.ColAgg) and e.a.shape[0] == 1:
        return e.a
    if isinstance(e, E.RowAgg) and e.a.shape[1] == 1:
        return e.a
    return e


def systemml_lite_rewrite(e: E.Expr) -> E.Expr:
    """Apply the static rule set to fixpoint (SystemML iterates its
    simplification passes a bounded number of times)."""
    for _ in range(5):
        nxt = _rw(e)
        if nxt == e:
            return e
        e = nxt
    return e
