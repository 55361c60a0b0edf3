"""Materialized views as integrity constraints (§6.2.4, Fig. 3).

A view ``V`` with definition expression ``E_V`` yields:

* ``V_IO``: body-of-``E_V`` atom patterns  ->  ``name(root, "V")``
  (every match of the view body has a corresponding stored result), and
* ``V_OI``: ``name(root, "V")`` -> body atoms (every stored tuple comes
  from a body match) — the converse inclusion PACB backchases with.

The view's result is then a zero-cost *scan leaf* during extraction,
with stats estimated from the definition.
"""
from __future__ import annotations

from dataclasses import dataclass

from . import expr as E
from .constraints import A, Cst, Rule
from .cost import expr_stats
from .encode import encode_patterns


@dataclass(frozen=True)
class View:
    name: str
    expr: E.Expr

    @property
    def shape(self) -> tuple[int, int]:
        return self.expr.shape


def view_rules(v: View) -> list[Rule]:
    root, atoms = encode_patterns(v.expr)
    if not isinstance(root, str):
        raise ValueError(f"view {v.name} must define a matrix/scalar class")
    head = A("name", root, Cst(v.name))
    return [
        Rule(f"view:{v.name}:IO", tuple(atoms), (head,)),
        Rule(f"view:{v.name}:OI", (head,), tuple(atoms)),
    ]


def view_leaf(v: View, estimator) -> E.Mat:
    """The scan leaf standing for the materialized view in rewritings."""
    st = expr_stats(v.expr, estimator)
    return E.Mat(v.name, st.r, st.c, nnz=int(round(st.nnz)))
