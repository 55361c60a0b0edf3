"""``enc_LA``: LA expressions -> conjunctive queries over VREM (§6.2.2).

Two encoders share one traversal:

* ``encode_expr``     — into a chase ``Store`` (concrete class IDs; the
  store's functional index performs the hash-consing that the paper's key
  EGDs would).
* ``encode_patterns`` — into variable patterns, used to turn view
  definitions into TGD constraints (§6.2.4, Fig. 3).
"""
from __future__ import annotations

import itertools

from . import expr as E
from .chase import Store
from .constraints import A, Cst, PAtom
from .cost import stats_for_leaf
from .vrem import KIND_SUFFIX


def encode_expr(e: E.Expr, store: Store, memo: dict | None = None) -> int:
    """Encode ``e`` into ``store``; returns the result's class ID."""
    memo = {} if memo is None else memo
    if e in memo:
        return store.find(memo[e])

    def emit(pred: str, ins: tuple, n_out: int = 1) -> tuple[int, ...]:
        outs = tuple(store.fresh() for _ in range(n_out))
        store.add(pred, tuple(ins) + outs)
        return tuple(store.find(o) for o in outs)

    ec = lambda x: encode_expr(x, store, memo)  # noqa: E731

    if isinstance(e, E.Mat):
        rid = store.fresh()
        store.add("name", (rid, store.const(e.name)))
        rid = store.find(rid)
        store.set_shape(rid, e.shape)
        leaf = store.estimator.leaf(e) if store.estimator else stats_for_leaf(e)
        store.set_stats(rid, leaf)
        if e.mtype:
            store.add("type", (rid, store.const(e.mtype)))
        out = rid
    elif isinstance(e, E.Ident):
        rid = store.fresh()
        store.set_shape(rid, e.shape)
        store.add("Identity", (rid,))
        out = store.find(rid)
    elif isinstance(e, E.ZeroM):
        rid = store.fresh()
        store.set_shape(rid, e.shape)
        store.add("Zero", (rid,))
        out = store.find(rid)
    elif isinstance(e, E.ConstS):
        out = store.const(float(e.value))
    elif isinstance(e, E.MatMul):
        out = emit("multi_M", (ec(e.a), ec(e.b)))[0]
    elif isinstance(e, E.MAdd):
        out = emit("add_M", (ec(e.a), ec(e.b)))[0]
    elif isinstance(e, E.EMul):
        out = emit("multi_E", (ec(e.a), ec(e.b)))[0]
    elif isinstance(e, E.EDiv):
        out = emit("div_M", (ec(e.a), ec(e.b)))[0]
    elif isinstance(e, E.SMul):
        out = emit("multi_MS", (ec(e.s), ec(e.a)))[0]
    elif isinstance(e, E.Tr):
        out = emit("tr", (ec(e.a),))[0]
    elif isinstance(e, E.Inv):
        out = emit("inv_M", (ec(e.a),))[0]
    elif isinstance(e, E.MExp):
        out = emit("exp", (ec(e.a),))[0]
    elif isinstance(e, E.Adj):
        out = emit("adj", (ec(e.a),))[0]
    elif isinstance(e, E.Diag):
        out = emit("diag", (ec(e.a),))[0]
    elif isinstance(e, E.RowAgg):
        out = emit(f"row{KIND_SUFFIX[e.kind]}", (ec(e.a),))[0]
    elif isinstance(e, E.ColAgg):
        out = emit(f"col{KIND_SUFFIX[e.kind]}", (ec(e.a),))[0]
    elif isinstance(e, E.Det):
        out = emit("det", (ec(e.a),))[0]
    elif isinstance(e, E.Trace):
        out = emit("trace", (ec(e.a),))[0]
    elif isinstance(e, E.Sum):
        out = emit(e.kind, (ec(e.a),))[0]
    elif isinstance(e, E.SAdd):
        out = emit("add_S", (ec(e.a), ec(e.b)))[0]
    elif isinstance(e, E.SMulS):
        out = emit("multi_S", (ec(e.a), ec(e.b)))[0]
    elif isinstance(e, E.SInvS):
        out = emit("inv_S", (ec(e.a),))[0]
    elif isinstance(e, E.SPow):
        out = emit("pow", (ec(e.a), store.const(float(e.k))))[0]
    elif isinstance(e, E.CBind):
        out = emit("cbind", (ec(e.a), ec(e.b)))[0]
    elif isinstance(e, E.SumD):
        out = emit("sum_D", (ec(e.a), ec(e.b)))[0]
    elif isinstance(e, E.ProdD):
        out = emit("product_D", (ec(e.a), ec(e.b)))[0]
    elif isinstance(e, E.Cho):
        out = emit("cho", (ec(e.a),))[0]
    elif isinstance(e, E.QrF):
        q, rr = emit("QR", (ec(e.a),), n_out=2)
        out = q if e.part == "Q" else rr
    elif isinstance(e, E.LuF):
        l_, u = emit("LU", (ec(e.a),), n_out=2)
        out = l_ if e.part == "L" else u
    elif isinstance(e, E.LupF):
        l_, u, p = emit("LUP", (ec(e.a),), n_out=3)
        out = {"L": l_, "U": u, "P": p}[e.part]
    else:  # pragma: no cover
        raise TypeError(f"cannot encode {type(e)}")
    memo[e] = out
    return store.find(out)


# ---------------------------------------------------------------------------
# Pattern encoding (for view constraints)
# ---------------------------------------------------------------------------
_NODE_PRED = [
    (E.MatMul, "multi_M"), (E.MAdd, "add_M"), (E.EMul, "multi_E"),
    (E.EDiv, "div_M"), (E.Tr, "tr"), (E.Inv, "inv_M"), (E.MExp, "exp"),
    (E.Adj, "adj"), (E.Diag, "diag"), (E.Det, "det"), (E.Trace, "trace"),
    (E.SAdd, "add_S"), (E.SMulS, "multi_S"), (E.SInvS, "inv_S"),
    (E.CBind, "cbind"), (E.SumD, "sum_D"), (E.ProdD, "product_D"),
    (E.Cho, "cho"),
]


def encode_patterns(e: E.Expr, counter=None, memo=None,
                    atoms=None) -> tuple[object, list[PAtom]]:
    """Encode ``e`` as (root-arg, atom patterns) with fresh variables.

    Used to build the ``V_IO``/``V_OI`` constraints of a view definition.
    """
    counter = counter if counter is not None else itertools.count()
    memo = {} if memo is None else memo
    atoms = [] if atoms is None else atoms
    if e in memo:
        return memo[e], atoms

    def var() -> str:
        return f"_v{next(counter)}"

    def sub(x: E.Expr):
        a, _ = encode_patterns(x, counter, memo, atoms)
        return a

    if isinstance(e, E.Mat):
        v = var()
        atoms.append(A("name", v, Cst(e.name)))
        if e.mtype:
            atoms.append(A("type", v, Cst(e.mtype)))
        out = v
    elif isinstance(e, E.Ident):
        v = var()
        atoms.append(A("Identity", v))
        out = v
    elif isinstance(e, E.ZeroM):
        v = var()
        atoms.append(A("Zero", v))
        out = v
    elif isinstance(e, E.ConstS):
        out = float(e.value)  # A() wraps non-str as Cst
    elif isinstance(e, E.SMul):
        v = var()
        atoms.append(A("multi_MS", sub(e.s), sub(e.a), v))
        out = v
    elif isinstance(e, E.RowAgg):
        v = var()
        atoms.append(A(f"row{KIND_SUFFIX[e.kind]}", sub(e.a), v))
        out = v
    elif isinstance(e, E.ColAgg):
        v = var()
        atoms.append(A(f"col{KIND_SUFFIX[e.kind]}", sub(e.a), v))
        out = v
    elif isinstance(e, E.Sum):
        v = var()
        atoms.append(A(e.kind, sub(e.a), v))
        out = v
    elif isinstance(e, E.SPow):
        v = var()
        atoms.append(A("pow", sub(e.a), float(e.k), v))
        out = v
    elif isinstance(e, E.QrF):
        q, rr = var(), var()
        atoms.append(A("QR", sub(e.a), q, rr))
        out = q if e.part == "Q" else rr
    elif isinstance(e, E.LuF):
        l_, u = var(), var()
        atoms.append(A("LU", sub(e.a), l_, u))
        out = l_ if e.part == "L" else u
    elif isinstance(e, E.LupF):
        l_, u, p = var(), var(), var()
        atoms.append(A("LUP", sub(e.a), l_, u, p))
        out = {"L": l_, "U": u, "P": p}[e.part]
    else:
        for cls, pred in _NODE_PRED:
            if isinstance(e, cls):
                ins = [sub(c) for c in e.children()]
                v = var()
                atoms.append(A(pred, *ins, v))
                out = v
                break
        else:  # pragma: no cover
            raise TypeError(f"cannot pattern-encode {type(e)}")
    memo[e] = out
    return out, atoms
