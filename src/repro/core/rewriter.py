"""HADAD's top-level API (Figure 1): encode -> chase under MMC ∪ C_V ->
extract the minimum-cost rewriting -> decode.

``hadad_rewrite`` is the whole pipeline; ``proves_equiv`` is the test
primitive used to validate the paper's expected rewrites (Tables 12/13/15
and Figure 4): the engine proves two expressions equivalent iff their
classes merge under the chase.
"""
from __future__ import annotations

import time
from dataclasses import dataclass

from . import expr as E
from .chase import ChaseStats, SizePruner, Store, chase
from .constraints import Rule
from .cost import NaiveEstimator, gamma
from .decode import extract_best
from .encode import encode_expr
from .morpheus_rules import cbind_rules
from .properties import decomposition_rules, la_property_rules, mmc_m_rules
from .systemml_rules import systemml_rules
from .views import View, view_leaf, view_rules


def _mentions_decompositions(*exprs: E.Expr) -> bool:
    for e in exprs:
        for n in E.walk(e):
            if isinstance(n, (E.Cho, E.QrF, E.LuF, E.LupF)):
                return True
            if isinstance(n, E.Mat) and n.mtype:
                return True
    return False


def default_rules(*, decompositions: bool = False, cbind: bool = True) -> list[Rule]:
    rules = mmc_m_rules() + la_property_rules() + systemml_rules()
    if cbind:
        rules += cbind_rules()
    if decompositions:
        rules += decomposition_rules()
    return rules


@dataclass
class RewriteResult:
    original: E.Expr
    best: E.Expr
    cost_before: float
    cost_after: float
    rw_find_s: float
    chase_stats: ChaseStats
    used_views: tuple[str, ...] = ()
    estimator_name: str = "naive"

    @property
    def improved(self) -> bool:
        return self.best != self.original and self.cost_after < self.cost_before

    @property
    def speedup_estimate(self) -> float:
        return self.cost_before / max(self.cost_after, 1.0)


def hadad_rewrite(expr: E.Expr, views: tuple[View, ...] | list[View] = (),
                  estimator=None, extra_rules: list[Rule] | None = None,
                  equiv_facts: list[tuple[E.Expr, E.Expr]] | None = None,
                  *, max_rounds: int = 6, max_atoms: int = 3000,
                  prune: bool = True) -> RewriteResult:
    """Rewrite ``expr`` using LA properties, SystemML rules and ``views``.

    ``equiv_facts`` registers known value-equalities between expressions
    (e.g. the Morpheus normalized-join fact M = cbind(S, K @ R)) before
    chasing. Returns the minimum-cost plan under the estimator's γ — the
    original expression itself is always a candidate.
    """
    est = estimator or NaiveEstimator()
    t0 = time.perf_counter()

    store = Store(estimator=est)
    memo: dict = {}
    root = encode_expr(expr, store, memo)

    view_exprs = [v.expr for v in views]
    for a, b in (equiv_facts or []):
        ia, ib = encode_expr(a, store, memo), encode_expr(b, store, memo)
        store.union(ia, ib)
        view_exprs.extend([a, b])
    store.rebuild()
    root = store.find(root)

    rules = default_rules(
        decompositions=_mentions_decompositions(expr, *view_exprs))
    for v in views:
        rules += view_rules(v)
    rules += list(extra_rules or [])

    # leaf registry: query base matrices, fact/view base matrices, view scans
    leaves: dict[str, E.Mat] = {}
    for src in [expr, *view_exprs]:
        leaves.update(E.base_matrices(src))
    for v in views:
        leaves[v.name] = view_leaf(v, est)

    # Prune_prov threshold (§7.3): cost of the best known plan, floored at
    # the largest input size — chase steps producing atoms no bigger than an
    # input are scaffolding (decomposition/view bodies), not candidate
    # intermediates, and must survive even for cheap queries. As in the
    # paper, the threshold is re-tightened whenever a cheaper rewriting is
    # discovered (after every chase round).
    floor = max((m.r * m.c for src in [expr, *view_exprs]
                 for m in E.base_matrices(src).values()), default=1)
    pruner = SizePruner(est, threshold=max(gamma(expr, est), float(floor))) \
        if prune else None

    def _tighten(s: Store) -> None:
        b = extract_best(s, s.find(root), leaves, est, max_passes=20)
        if b is not None:
            pruner.threshold = max(float(floor),
                                   min(pruner.threshold, b.cost))

    stats = chase(store, rules, max_rounds=max_rounds, max_atoms=max_atoms,
                  pruner=pruner, on_round=_tighten if pruner else None)
    root = store.find(root)

    best = extract_best(store, root, leaves, est)
    cost_before = gamma(expr, est)
    chosen = expr
    if best is not None:
        cost_candidate = gamma(best.expr, est)
        if (cost_candidate, E.size_of(best.expr)) < (cost_before, E.size_of(expr)):
            chosen = best.expr
    cost_after = gamma(chosen, est)
    rw_find = time.perf_counter() - t0

    used = tuple(sorted({n.name for n in E.walk(chosen)
                         if isinstance(n, E.Mat) and any(v.name == n.name for v in views)}))
    return RewriteResult(expr, chosen, cost_before, cost_after, rw_find,
                         stats, used, est.name)


def proves_equiv(e1: E.Expr, e2: E.Expr, views=(), extra_rules=None,
                 equiv_facts=None, *, max_rounds: int = 6,
                 max_atoms: int = 3000) -> bool:
    """True iff the chase proves ``e1`` ≡ ``e2`` under MMC ∪ C_V.

    Runs without pruning: this is the completeness primitive (§8), not the
    cost-directed search.
    """
    est = NaiveEstimator()
    store = Store(estimator=est)
    memo: dict = {}
    r1 = encode_expr(e1, store, memo)
    r2 = encode_expr(e2, store, memo)
    view_exprs = [v.expr for v in views]
    for a, b in (equiv_facts or []):
        ia, ib = encode_expr(a, store, memo), encode_expr(b, store, memo)
        store.union(ia, ib)
        view_exprs.extend([a, b])
    store.rebuild()
    if store.find(r1) == store.find(r2):
        return True
    rules = default_rules(
        decompositions=_mentions_decompositions(e1, e2, *view_exprs))
    for v in views:
        rules += view_rules(v)
    rules += list(extra_rules or [])
    chase(store, rules, max_rounds=max_rounds, max_atoms=max_atoms,
          stop_when=lambda s: s.find(r1) == s.find(r2))
    return store.find(r1) == store.find(r2)
