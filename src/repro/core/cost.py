"""Cost model γ and the naïve metadata (worst-case) sparsity estimator (§7).

``γ(E)`` = sum of estimated *stored sizes* of the intermediate results if
``E`` is evaluated as stated (Example 7.1). Sparse results are stored
without zeros, so "size" is estimated nnz; dense results cost rows*cols.
Following Example 7.1, the final (root) result is not counted — it is
common to all equivalent plans of the same query.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np

from . import expr as E
from .vrem import COL_AGG_PREDS, ROW_AGG_PREDS, SCALAR_OUT_PREDS


@dataclass(frozen=True)
class MatStats:
    """Dimensions + estimated nnz of one equivalence class; ``hr``/``hc``
    are optional MNC row/column non-zero-count histograms."""

    r: int
    c: int
    nnz: float
    hr: object = None  # np.ndarray | None — excluded from eq/hash on purpose
    hc: object = None

    @property
    def size(self) -> float:
        """Stored size: nnz for sparse representations, capped at dense."""
        return float(min(self.nnz, self.r * self.c))

    @property
    def dense_size(self) -> int:
        return self.r * self.c

    @property
    def sparsity(self) -> float:
        return self.nnz / max(1, self.r * self.c)


SCALAR_STATS = MatStats(1, 1, 1.0)


def stats_for_leaf(m: E.Mat) -> MatStats:
    nnz = float(m.nnz) if m.nnz is not None else float(m.r * m.c)
    return MatStats(m.r, m.c, nnz)


class NaiveEstimator:
    """Worst-case metadata estimator [22]: output sparsity derived only from
    base-matrix metadata, no runtime inspection."""

    name = "naive"

    def leaf(self, m: E.Mat) -> MatStats:
        return stats_for_leaf(m)

    # -- per-node cost hooks -------------------------------------------------
    def op_size(self, pred: str, ins: list, out: MatStats) -> float:
        """Size charged for one operator node (default: its output size)."""
        return out.size

    def node_cost(self, e, ch_stats: list, out: MatStats) -> float:
        """AST-level twin of ``op_size`` used by ``gamma``."""
        return out.size

    # -- per-op propagation -------------------------------------------------
    def matmul(self, a: MatStats, b: MatStats) -> MatStats:
        r, c = a.r, b.c
        nnz = min(r * c, a.nnz * c, b.nnz * r)
        return MatStats(r, c, float(nnz))

    def add(self, a: MatStats, b: MatStats) -> MatStats:
        return MatStats(a.r, a.c, float(min(a.r * a.c, a.nnz + b.nnz)))

    def emul(self, a: MatStats, b: MatStats) -> MatStats:
        return MatStats(a.r, a.c, float(min(a.nnz, b.nnz)))

    def ediv(self, a: MatStats, b: MatStats) -> MatStats:
        return MatStats(a.r, a.c, float(min(a.nnz, a.r * a.c)))

    def smul(self, a: MatStats) -> MatStats:
        return a

    def transpose(self, a: MatStats) -> MatStats:
        hr, hc = a.hc, a.hr
        return MatStats(a.c, a.r, a.nnz, hr, hc)

    def dense_unary(self, a: MatStats) -> MatStats:
        return MatStats(a.r, a.c, float(a.r * a.c))

    def rowagg(self, a: MatStats) -> MatStats:
        return MatStats(a.r, 1, float(min(a.r, a.nnz)))

    def colagg(self, a: MatStats) -> MatStats:
        return MatStats(1, a.c, float(min(a.c, a.nnz)))

    def diagonal(self, a: MatStats) -> MatStats:
        return MatStats(a.r, 1, float(min(a.r, a.nnz)))

    def cbind_(self, a: MatStats, b: MatStats) -> MatStats:
        return MatStats(a.r, a.c + b.c, a.nnz + b.nnz)

    def dsum(self, a: MatStats, b: MatStats) -> MatStats:
        return MatStats(a.r + b.r, a.c + b.c, a.nnz + b.nnz)

    def kron(self, a: MatStats, b: MatStats) -> MatStats:
        return MatStats(a.r * b.r, a.c * b.c, a.nnz * b.nnz)

    def tri_factor(self, a: MatStats) -> MatStats:
        # triangular decomposition factor: ~half dense
        return MatStats(a.r, a.c, float(a.r * a.c) / 2.0 + a.r / 2.0)

    # -- dispatch on VREM predicate ----------------------------------------
    def propagate(self, pred: str, ins: list[MatStats | None]) -> list[MatStats | None]:
        """Estimated stats of each output class of a VREM atom, given input
        class stats (None where unknown). Returns None entries if underivable."""
        if any(i is None for i in ins):
            if pred in SCALAR_OUT_PREDS:
                return [SCALAR_STATS]
            return [None] * 4  # enough for the widest out_pos
        a = ins[0] if ins else None
        b = ins[1] if len(ins) > 1 else None
        if pred == "multi_M":
            return [self.matmul(a, b)]
        if pred == "add_M":
            return [self.add(a, b)]
        if pred == "multi_E":
            return [self.emul(a, b)]
        if pred == "div_M":
            return [self.ediv(a, b)]
        if pred == "multi_MS":
            return [self.smul(b)]
        if pred == "tr":
            return [self.transpose(a)]
        if pred in ("inv_M", "exp", "adj"):
            return [self.dense_unary(a)]
        if pred == "diag":
            return [self.diagonal(a)]
        if pred in ROW_AGG_PREDS:
            return [self.rowagg(a)]
        if pred in COL_AGG_PREDS:
            return [self.colagg(a)]
        if pred in SCALAR_OUT_PREDS:
            return [SCALAR_STATS]
        if pred == "cbind":
            return [self.cbind_(a, b)]
        if pred == "sum_D":
            return [self.dsum(a, b)]
        if pred == "product_D":
            return [self.kron(a, b)]
        if pred == "cho":
            return [self.tri_factor(a)]
        if pred in ("QR", "LU"):
            f = self.tri_factor(a)
            return [f, f]
        if pred == "LUP":
            f = self.tri_factor(a)
            return [f, f, MatStats(a.r, a.c, a.r)]
        return [None] * 4


class JoinWorkEstimator(NaiveEstimator):
    """Substrate-aware variant of γ for the relational (COO) executor: a
    matrix product materializes its pre-aggregation *join relation* (one
    row per multiply term) before the group-by, so that relation counts
    among the intermediate results. This is the relational reading of LA
    evaluation that the VREM encoding itself takes; it is what makes
    §9.2.1's rowSums(NM) -> N rowSums(M) rewrite profitable even though
    the product's *output* is small (the paper's M there is a 20Mx120
    join output, i.e. itself an expensive intermediate)."""

    name = "joinwork"

    @staticmethod
    def _mm_terms(a: MatStats, b: MatStats) -> float:
        # expected multiply-term count under uniform nnz placement
        return a.nnz * b.nnz / max(1.0, float(a.c))

    def op_size(self, pred: str, ins: list, out: MatStats) -> float:
        base = out.size
        if pred == "multi_M" and ins and all(i is not None for i in ins[:2]):
            base += self._mm_terms(ins[0], ins[1])
        return base

    def node_cost(self, e, ch_stats: list, out: MatStats) -> float:
        base = out.size
        if isinstance(e, E.MatMul):
            base += self._mm_terms(ch_stats[0], ch_stats[1])
        return base


# ---------------------------------------------------------------------------
# γ over ASTs (cost of evaluating an expression "as stated")
# ---------------------------------------------------------------------------
_DENSE_UNARY = (E.Inv, E.MExp, E.Adj)


def expr_stats(e: E.Expr, est, memo=None) -> MatStats:
    """Estimated stats of ``e``'s result under estimator ``est``."""
    memo = {} if memo is None else memo
    if e in memo:
        return memo[e]
    if isinstance(e, E.Mat):
        s = est.leaf(e)
    elif isinstance(e, E.Ident):
        s = MatStats(e.k, e.k, float(e.k))
    elif isinstance(e, E.ZeroM):
        s = MatStats(e.r, e.c, 0.0)
    elif e.is_scalar or isinstance(e, E.ConstS):
        for ch in e.children():
            expr_stats(ch, est, memo)
        s = SCALAR_STATS
    else:
        ch = [expr_stats(c, est, memo) for c in e.children()]
        if isinstance(e, E.MatMul):
            s = est.matmul(ch[0], ch[1])
        elif isinstance(e, E.MAdd):
            s = est.add(ch[0], ch[1])
        elif isinstance(e, E.EMul):
            s = est.emul(ch[0], ch[1])
        elif isinstance(e, E.EDiv):
            s = est.ediv(ch[0], ch[1])
        elif isinstance(e, E.SMul):
            s = est.smul(ch[1])
        elif isinstance(e, E.Tr):
            s = est.transpose(ch[0])
        elif isinstance(e, _DENSE_UNARY):
            s = est.dense_unary(ch[0])
        elif isinstance(e, E.Diag):
            s = est.diagonal(ch[0])
        elif isinstance(e, E.RowAgg):
            s = est.rowagg(ch[0])
        elif isinstance(e, E.ColAgg):
            s = est.colagg(ch[0])
        elif isinstance(e, E.CBind):
            s = est.cbind_(ch[0], ch[1])
        elif isinstance(e, E.SumD):
            s = est.dsum(ch[0], ch[1])
        elif isinstance(e, E.ProdD):
            s = est.kron(ch[0], ch[1])
        elif isinstance(e, (E.Cho, E.QrF, E.LuF, E.LupF)):
            s = est.tri_factor(ch[0])
        else:  # pragma: no cover
            raise TypeError(f"no stats rule for {type(e)}")
    memo[e] = s
    return s


def gamma(e: E.Expr, est=None) -> float:
    """Paper cost γ(E): Σ costs of intermediate results, shared
    subexpressions counted once (DAG semantics). Following Example 7.1 the
    root's *output* is excluded — it is common to every equivalent plan —
    but any work the root operator itself performs (e.g. a product's join
    relation under JoinWorkEstimator) is plan-specific and counts."""
    est = est or NaiveEstimator()
    memo: dict[E.Expr, MatStats] = {}
    expr_stats(e, est, memo)
    total = 0.0
    counted: set[E.Expr] = set()
    for n in E.walk(e):
        if not n.children() or n in counted:
            continue
        counted.add(n)
        ch = [memo[c] for c in n.children()]
        total += est.node_cost(n, ch, memo[n])
    if e.children():
        total -= memo[e].size
    return total
