"""TGD/EGD constraint DSL over VREM patterns (paper §4.1, §6.2.3).

A rule is a premise (conjunction of atom patterns) and either a
conclusion (atom patterns, possibly with existential variables — a TGD)
or a set of equalities (an EGD). Guards are python predicates over the
binding (used for dimension side-conditions that the paper writes with
``size`` atoms).

Equational LA properties that the paper states in one direction (the
backchase exploits the other direction implicitly) are installed in both
directions with ``bidir=True``.
"""
from __future__ import annotations

from dataclasses import dataclass, field
from typing import Callable

from .vrem import PREDS


@dataclass(frozen=True)
class Cst:
    """A constant appearing in a pattern (a name string, a number, a type tag)."""

    value: object


@dataclass(frozen=True)
class PAtom:
    pred: str
    args: tuple  # str variables or Cst constants

    def __post_init__(self):
        p = PREDS.get(self.pred)
        if p is None:
            raise ValueError(f"unknown predicate {self.pred}")
        if len(self.args) != p.arity:
            raise ValueError(f"{self.pred} arity {p.arity} != {len(self.args)}")


def A(pred: str, *args) -> PAtom:
    """Atom pattern: string args are variables; wrap string constants (matrix
    names, type tags) in ``Cst`` explicitly. Non-strings become constants."""
    return PAtom(pred, tuple(
        a if isinstance(a, (str, Cst)) else Cst(a) for a in args))


Guard = Callable[[dict, "object"], bool]  # (binding var->id, store) -> bool


@dataclass(frozen=True)
class Rule:
    name: str
    premise: tuple[PAtom, ...]
    conclusion: tuple[PAtom, ...] = ()
    eqs: tuple[tuple, ...] = ()  # pairs of (var|Cst)
    guard: Guard | None = None

    @property
    def is_egd(self) -> bool:
        return bool(self.eqs)

    @property
    def exist_vars(self) -> frozenset[str]:
        prem = {a for at in self.premise for a in at.args if isinstance(a, str)}
        conc = {a for at in self.conclusion for a in at.args if isinstance(a, str)}
        return frozenset(conc - prem)


def tgd(name: str, premise: list[PAtom], conclusion: list[PAtom],
        guard: Guard | None = None, bidir: bool = False,
        rev_guard: Guard | None = None) -> list[Rule]:
    """A TGD; with ``bidir`` also emit the reversed direction. ``rev_guard``
    carries shape side-conditions the reversed premise does not imply."""
    rules = [Rule(name, tuple(premise), tuple(conclusion), (), guard)]
    if bidir:
        rules.append(Rule(name + "~", tuple(conclusion), tuple(premise), (), rev_guard))
    return rules


def egd(name: str, premise: list[PAtom], eqs: list[tuple],
        guard: Guard | None = None) -> list[Rule]:
    return [Rule(name, tuple(premise), (), tuple(eqs), guard)]


# ---------------------------------------------------------------------------
# Common guards (dimension side-conditions; paper encodes these via `size`)
# ---------------------------------------------------------------------------
def square(*vars_: str) -> Guard:
    def g(bind, store):
        for v in vars_:
            s = store.shape_of(bind[v])
            if s is None or s[0] != s[1]:
                return False
        return True
    return g


def row_vector(v: str) -> Guard:
    def g(bind, store):
        s = store.shape_of(bind[v])
        return s is not None and s[0] == 1
    return g


def col_vector(v: str) -> Guard:
    def g(bind, store):
        s = store.shape_of(bind[v])
        return s is not None and s[1] == 1
    return g


def same_shape(*vars_: str) -> Guard:
    def g(bind, store):
        shapes = [store.shape_of(bind[v]) for v in vars_]
        return all(s is not None for s in shapes) and len(set(shapes)) == 1
    return g


def rows_eq(a: str, b: str) -> Guard:
    def g(bind, store):
        sa, sb = store.shape_of(bind[a]), store.shape_of(bind[b])
        return sa is not None and sb is not None and sa[0] == sb[0]
    return g


def all_guards(*gs: Guard) -> Guard:
    def g(bind, store):
        return all(x(bind, store) for x in gs)
    return g
