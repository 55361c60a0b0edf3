"""VREM — Virtual Relational Encoding of Matrices (paper §6.2, Table 1).

Every LA operation is an uninterpreted *functional* relation: the last
argument(s) identify the equivalence class of the operation's result,
and the key constraint "same inputs => same output class" (the paper's
EGDs ``I_multi_M`` etc.) is enforced structurally by the store's
functional index, giving congruence closure for free.

Shapes are class metadata rather than explicit ``size`` atoms: the
paper's ``I_size`` EGD says the class ID determines the dimensions, so a
``root-id -> (rows, cols)`` map is an equivalent (and cheaper) encoding;
rules that need dimension tests use guards over this map.
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Callable, Optional

Shape = tuple[int, int]
ShapeFn = Callable[[list[Optional[Shape]]], Optional[list[Optional[Shape]]]]


@dataclass(frozen=True)
class Pred:
    """A VREM relation: arity, which positions are inputs vs outputs."""

    name: str
    arity: int
    in_pos: tuple[int, ...]
    out_pos: tuple[int, ...]
    shape_fn: ShapeFn | None = None


def _first(shapes):
    return shapes[0]


def _same(shapes):  # output shaped like (first matrix) input
    return [shapes[0]] if shapes[0] else None


def _mm(shapes):
    a, b = shapes
    if a and b:
        return [(a[0], b[1])]
    return None


def _smul(shapes):  # (scalar, matrix) -> matrix
    return [shapes[1]] if shapes[1] else None


def _tr(shapes):
    a = shapes[0]
    return [(a[1], a[0])] if a else None


def _scalar(shapes):
    return [(1, 1)]


def _rowagg(shapes):
    a = shapes[0]
    return [(a[0], 1)] if a else None


def _colagg(shapes):
    a = shapes[0]
    return [(1, a[1])] if a else None


def _diag(shapes):
    a = shapes[0]
    return [(a[0], 1)] if a else None


def _cbind(shapes):
    a, b = shapes
    if a and b:
        return [(a[0], a[1] + b[1])]
    return None


def _dsum(shapes):
    a, b = shapes
    if a and b:
        return [(a[0] + b[0], a[1] + b[1])]
    return None


def _kron(shapes):
    a, b = shapes
    if a and b:
        return [(a[0] * b[0], a[1] * b[1])]
    return None


def _two_same(shapes):  # decompositions: factors shaped like the input
    a = shapes[0]
    return [a, a] if a else None


def _three_same(shapes):
    a = shapes[0]
    return [a, a, a] if a else None


def _binop(name: str) -> Pred:
    return Pred(name, 3, (0, 1), (2,), _same)


#: the VREM schema. ``name`` is keyed on the *name* (I_name: same name =>
#: same class), hence input position 1 and output position 0.
PREDS: dict[str, Pred] = {
    p.name: p
    for p in [
        Pred("name", 2, (1,), (0,), None),
        Pred("Identity", 1, (0,), (), None),
        Pred("Zero", 1, (0,), (), None),
        Pred("type", 2, (0, 1), (), None),
        # binary matrix ops
        Pred("multi_M", 3, (0, 1), (2,), _mm),
        _binop("add_M"),
        _binop("div_M"),
        _binop("multi_E"),
        Pred("multi_MS", 3, (0, 1), (2,), _smul),
        Pred("cbind", 3, (0, 1), (2,), _cbind),
        Pred("sum_D", 3, (0, 1), (2,), _dsum),
        Pred("product_D", 3, (0, 1), (2,), _kron),
        # unary matrix ops
        Pred("tr", 2, (0,), (1,), _tr),
        Pred("inv_M", 2, (0,), (1,), _same),
        Pred("exp", 2, (0,), (1,), _same),
        Pred("adj", 2, (0,), (1,), _same),
        Pred("diag", 2, (0,), (1,), _diag),
        # row/col aggregates (SystemML rule families, Table 11)
        *[Pred(f"row{k}", 2, (0,), (1,), _rowagg)
          for k in ("Sums", "Mins", "Maxs", "Means", "Vars")],
        *[Pred(f"col{k}", 2, (0,), (1,), _colagg)
          for k in ("Sums", "Mins", "Maxs", "Means", "Vars")],
        # scalar-producing ops
        Pred("det", 2, (0,), (1,), _scalar),
        Pred("trace", 2, (0,), (1,), _scalar),
        *[Pred(k, 2, (0,), (1,), _scalar) for k in ("sum", "min", "max", "mean", "var")],
        # scalar arithmetic
        Pred("add_S", 3, (0, 1), (2,), _scalar),
        Pred("multi_S", 3, (0, 1), (2,), _scalar),
        Pred("inv_S", 2, (0,), (1,), _scalar),
        Pred("pow", 3, (0, 1), (2,), _scalar),
        # decompositions (§6.2.5)
        Pred("cho", 2, (0,), (1,), _same),
        Pred("QR", 3, (0,), (1, 2), _two_same),
        Pred("LU", 3, (0,), (1, 2), _two_same),
        Pred("LUP", 4, (0,), (1, 2, 3), _three_same),
    ]
}

ROW_AGG_PREDS = {f"row{k}" for k in ("Sums", "Mins", "Maxs", "Means", "Vars")}
COL_AGG_PREDS = {f"col{k}" for k in ("Sums", "Mins", "Maxs", "Means", "Vars")}
FULL_AGG_PREDS = {"sum", "min", "max", "mean", "var"}
SCALAR_OUT_PREDS = {"det", "trace", "add_S", "multi_S", "inv_S", "pow"} | FULL_AGG_PREDS

#: agg kind <-> pred-suffix mapping shared with the AST
KIND_SUFFIX = {"sum": "Sums", "min": "Mins", "max": "Maxs", "mean": "Means", "var": "Vars"}
SUFFIX_KIND = {v: k for k, v in KIND_SUFFIX.items()}
