"""Minimum-cost rewriting extraction + decoding (paper's backchase with
``Prune_prov`` + ``dec()``, §5, §7.3).

After the chase, the store is a congruence-closed e-graph: each class is
a set of value-equal expressions, each functional atom an operator node.
Extraction computes, per class, the cheapest executable expression under
the (monotonic) cost model γ — the same minimum-cost rewriting the
provenance-directed backchase reads off, obtained by fixpoint instead of
provenance formulas. Leaves cost 0: base-matrix scans, *view scans*
(``name(R,"V")`` atoms introduced by the view constraints), identity /
zero / constant classes.
"""
from __future__ import annotations

from dataclasses import dataclass

from . import expr as E
from .chase import Store
from .cost import MatStats, SCALAR_STATS
from .vrem import COL_AGG_PREDS, FULL_AGG_PREDS, PREDS, ROW_AGG_PREDS, SUFFIX_KIND


@dataclass
class Best:
    cost: float
    n_ops: int
    stats: MatStats
    expr: E.Expr


def _build(pred: str, out_index: int, ch: list[E.Expr]) -> E.Expr | None:
    """AST node for one functional atom; None if not executable as stated."""
    try:
        if pred == "multi_M":
            return ch[0] @ ch[1]
        if pred == "add_M":
            return E.MAdd(ch[0], ch[1])
        if pred == "multi_E":
            return E.EMul(ch[0], ch[1])
        if pred == "div_M":
            return E.EDiv(ch[0], ch[1])
        if pred == "multi_MS":
            return E.SMul(ch[0], ch[1])
        if pred == "tr":
            return E.Tr(ch[0])
        if pred == "inv_M":
            return E.Inv(ch[0])
        if pred == "exp":
            return E.MExp(ch[0])
        if pred == "adj":
            return E.Adj(ch[0])
        if pred == "diag":
            return E.Diag(ch[0])
        if pred in ROW_AGG_PREDS:
            return E.RowAgg(SUFFIX_KIND[pred[3:]], ch[0])
        if pred in COL_AGG_PREDS:
            return E.ColAgg(SUFFIX_KIND[pred[3:]], ch[0])
        if pred == "det":
            return E.Det(ch[0])
        if pred == "trace":
            return E.Trace(ch[0])
        if pred in FULL_AGG_PREDS:
            return E.Sum(ch[0], pred)
        if pred == "add_S":
            return E.SAdd(ch[0], ch[1])
        if pred == "multi_S":
            return E.SMulS(ch[0], ch[1])
        if pred == "inv_S":
            return E.SInvS(ch[0])
        if pred == "pow":
            k = ch[1]
            if not isinstance(k, E.ConstS):
                return None
            return E.SPow(ch[0], k.value)
        if pred == "cbind":
            return E.CBind(ch[0], ch[1])
        if pred == "sum_D":
            return E.SumD(ch[0], ch[1])
        if pred == "product_D":
            return E.ProdD(ch[0], ch[1])
        if pred == "cho":
            return E.Cho(ch[0])
        if pred == "QR":
            return E.QrF(ch[0], "Q" if out_index == 0 else "R")
        if pred == "LU":
            return E.LuF(ch[0], "L" if out_index == 0 else "U")
        if pred == "LUP":
            return E.LupF(ch[0], ("L", "U", "P")[out_index])
    except ValueError:
        return None  # ill-typed as stated (e.g. non-scalar SMul operand)
    return None


def leaf_classes(store: Store, leaves: dict[str, E.Mat], estimator) -> dict[int, Best]:
    """Zero-cost entry points: named scans (base matrices *and* views),
    identities, zeros, scalar constants."""
    best: dict[int, Best] = {}

    def put(cls: int, expr: E.Expr, stats: MatStats) -> None:
        cur = best.get(cls)
        if cur is None or cur.stats.nnz > stats.nnz:
            best[cls] = Best(0.0, 0, stats, expr)

    for (mid, nid) in store.atoms.get("name", ()):
        val = store.const_of.get(store.find(nid))
        m = leaves.get(val)
        if m is not None:
            put(store.find(mid), m, estimator.leaf(m))
    for (iid,) in store.atoms.get("Identity", ()):
        sh = store.shape_of(iid)
        if sh is not None:
            put(store.find(iid), E.Ident(sh[0]), MatStats(sh[0], sh[0], float(sh[0])))
    for (oid,) in store.atoms.get("Zero", ()):
        sh = store.shape_of(oid)
        if sh is not None:
            put(store.find(oid), E.ZeroM(sh[0], sh[1]), MatStats(sh[0], sh[1], 0.0))
    for cid, val in store.const_of.items():
        if isinstance(val, (int, float)):
            put(store.find(cid), E.ConstS(float(val)), SCALAR_STATS)
    return best


def extract_best(store: Store, root: int, leaves: dict[str, E.Mat],
                 estimator, max_passes: int = 60) -> Best | None:
    """Cheapest executable expression of the root class (tie-break: fewer ops)."""
    best = leaf_classes(store, leaves, estimator)
    nodes = []
    for pred, atoms in store.atoms.items():
        p = PREDS[pred]
        if not p.out_pos or pred == "name":
            continue
        for args in atoms:
            for oi, opos in enumerate(p.out_pos):
                nodes.append((pred, args, oi, opos))

    for _ in range(max_passes):
        changed = False
        for pred, args, oi, opos in nodes:
            p = PREDS[pred]
            ch_best = []
            ok = True
            for ipos in p.in_pos:
                b = best.get(store.find(args[ipos]))
                if b is None:
                    ok = False
                    break
                ch_best.append(b)
            if not ok:
                continue
            outs = estimator.propagate(pred, [b.stats for b in ch_best])
            st = outs[oi] if outs and oi < len(outs) else None
            if st is None:
                continue
            cost = sum(b.cost for b in ch_best) + \
                estimator.op_size(pred, [b.stats for b in ch_best], st)
            n_ops = 1 + sum(b.n_ops for b in ch_best)
            cls = store.find(args[opos])
            cur = best.get(cls)
            if cur is not None and (cur.cost, cur.n_ops) <= (cost, n_ops):
                continue
            expr = _build(pred, oi, [b.expr for b in ch_best])
            if expr is None:
                continue
            best[cls] = Best(cost, n_ops, st, expr)
            changed = True
        if not changed:
            break
    return best.get(store.find(root))


# ---------------------------------------------------------------------------
# Decoding to native syntaxes (paper's dec() step)
# ---------------------------------------------------------------------------
def to_r(e: E.Expr) -> str:
    """R-flavoured rendering (solve() for inverse, %*% for product)."""
    s = E.to_str(e)
    return s.replace("inv(", "solve(").replace("expm(", "expm(")


def to_dml(e: E.Expr) -> str:
    """SystemML DML-flavoured rendering."""
    s = E.to_str(e)
    return s.replace("inv(", "inv(").replace(" . ", " * ")
