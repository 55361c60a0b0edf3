"""Bounded restricted chase over the VREM encoding (paper §4.2, §7.3).

The store keeps atoms over canonical equivalence-class IDs with a
union-find; every functional VREM predicate acts as its key EGD
(``I_multi_M`` etc.), so the saturated store is congruence-closed — the
classes are exactly the paper's value-equality IDs. TGDs fire under the
restricted-chase test ("skip if the conclusion already has a match"),
EGDs merge classes, and an optional ``Prune_prov``-style pruner skips
TGD firings whose freshly created intermediates are provably too
expensive to appear in a minimum-cost rewriting (§7.3).

Termination is enforced by round/atom budgets — the paper likewise
assumes a terminating ``LA_prop``.
"""
from __future__ import annotations

from collections import defaultdict
from dataclasses import dataclass

from .constraints import Cst, PAtom, Rule
from .cost import MatStats, SCALAR_STATS
from .vrem import PREDS, Pred


class Inconsistent(Exception):
    """Two distinct constants were equated by an EGD."""


class Store:
    """Atom store with union-find over class IDs and class metadata
    (shape, optional sparsity stats, structural type)."""

    def __init__(self, estimator=None):
        self._parent: dict[int, int] = {}
        self._next = 0
        self.const_of: dict[int, object] = {}
        self._id_of_const: dict[object, int] = {}
        self.atoms: dict[str, set[tuple]] = defaultdict(set)
        self._func: dict[tuple, tuple] = {}
        self._arg_index: dict[tuple, set[tuple]] = defaultdict(set)
        self._index_dirty = False
        self._shape: dict[int, tuple[int, int]] = {}
        self._stats: dict[int, MatStats] = {}
        self.estimator = estimator
        self.n_merges = 0

    # -- terms -------------------------------------------------------------
    def fresh(self) -> int:
        i = self._next
        self._next += 1
        self._parent[i] = i
        return i

    def const(self, value) -> int:
        if value in self._id_of_const:
            return self.find(self._id_of_const[value])
        i = self.fresh()
        self.const_of[i] = value
        self._id_of_const[value] = i
        if isinstance(value, (int, float)):
            self._shape[i] = (1, 1)
            self._stats[i] = SCALAR_STATS
        return i

    def find(self, i: int) -> int:
        p = self._parent
        while p[i] != i:
            p[i] = p[p[i]]
            i = p[i]
        return i

    def union(self, a: int, b: int) -> bool:
        ra, rb = self.find(a), self.find(b)
        if ra == rb:
            return False
        ca, cb = ra in self.const_of, rb in self.const_of
        if ca and cb:
            if self.const_of[ra] != self.const_of[rb]:
                raise Inconsistent(
                    f"cannot equate constants {self.const_of[ra]!r} != {self.const_of[rb]!r}")
            # same value interned twice cannot happen, but be safe
        # keep a constant as the representative if present
        root, other = (ra, rb) if (ca or (not cb and ra < rb)) else (rb, ra)
        self._parent[other] = root
        # merge metadata: shapes must agree; keep the lower-nnz stats estimate
        so, sr = self._shape.get(other), self._shape.get(root)
        if so is not None:
            if sr is not None and sr != so:
                raise Inconsistent(f"shape clash on merge: {sr} vs {so}")
            self._shape[root] = so
        to, tr_ = self._stats.get(other), self._stats.get(root)
        if to is not None and (tr_ is None or to.nnz < tr_.nnz):
            self._stats[root] = to
        self.n_merges += 1
        self._index_dirty = True
        return True

    # -- metadata ----------------------------------------------------------
    def shape_of(self, i: int):
        return self._shape.get(self.find(i))

    def set_shape(self, i: int, shape) -> None:
        if shape is None:
            return
        r = self.find(i)
        prev = self._shape.get(r)
        if prev is not None and prev != shape:
            raise Inconsistent(f"shape clash {prev} vs {shape} for class {r}")
        self._shape[r] = shape

    def stats_of(self, i: int):
        return self._stats.get(self.find(i))

    def set_stats(self, i: int, st: MatStats | None) -> None:
        if st is None:
            return
        r = self.find(i)
        prev = self._stats.get(r)
        if prev is None or st.nnz < prev.nnz:
            self._stats[r] = st

    # -- atoms -------------------------------------------------------------
    @property
    def n_atoms(self) -> int:
        return sum(len(s) for s in self.atoms.values())

    def add(self, pred: str, args: tuple) -> bool:
        """Insert an atom; functional-index collisions merge output classes.
        Returns True if anything changed."""
        p = PREDS[pred]
        args = tuple(self.find(a) for a in args)
        if args in self.atoms[pred]:
            return False
        changed = False
        if p.out_pos:
            key = (pred, tuple(args[i] for i in p.in_pos))
            prev = self._func.get(key)
            if prev is None:
                self._func[key] = tuple(args[i] for i in p.out_pos)
            else:
                for pos, o in zip(p.out_pos, prev):
                    if self.find(args[pos]) != self.find(o):
                        self.union(args[pos], o)
                        changed = True
                args = tuple(self.find(a) for a in args)
                if args in self.atoms[pred]:
                    return changed
        self.atoms[pred].add(args)
        if not self._index_dirty:
            for pos, a in enumerate(args):
                self._arg_index[(pred, pos, a)].add(args)
        self._infer_meta(p, args)
        return True

    def _infer_meta(self, p: Pred, args: tuple) -> None:
        if p.shape_fn is None or not p.out_pos:
            return
        in_shapes = [self.shape_of(args[i]) for i in p.in_pos]
        outs = p.shape_fn(in_shapes)
        if outs:
            for pos, sh in zip(p.out_pos, outs):
                if sh is not None and self.shape_of(args[pos]) is None:
                    self._shape[self.find(args[pos])] = sh
        if self.estimator is not None:
            in_stats = [self.stats_of(args[i]) for i in p.in_pos]
            outs_st = self.estimator.propagate(p.name, in_stats)
            for pos, st in zip(p.out_pos, outs_st):
                self.set_stats(args[pos], st)

    def candidates(self, pred: str, pos: int, term: int):
        """Atoms of ``pred`` whose argument at ``pos`` is in ``term``'s class
        (an index over canonical arg roots, lazily rebuilt after unions)."""
        if self._index_dirty:
            self._arg_index = defaultdict(set)
            for p_, atoms in self.atoms.items():
                for args in atoms:
                    for i, a in enumerate(args):
                        self._arg_index[(p_, i, self.find(a))].add(args)
            self._index_dirty = False
        return self._arg_index.get((pred, pos, self.find(term)), ())

    def rebuild(self) -> None:
        """Re-canonicalize all atoms and re-run functional merging to a
        congruence fixpoint after unions."""
        while True:
            merges_before = self.n_merges
            old = self.atoms
            self.atoms = defaultdict(set)
            self._func = {}
            for pred, atoms in old.items():
                p = PREDS[pred]
                for args in atoms:
                    c = tuple(self.find(a) for a in args)
                    if p.out_pos:
                        key = (pred, tuple(c[i] for i in p.in_pos))
                        prev = self._func.get(key)
                        if prev is None:
                            self._func[key] = tuple(c[i] for i in p.out_pos)
                        else:
                            for pos, o in zip(p.out_pos, prev):
                                if self.find(c[pos]) != self.find(o):
                                    self.union(c[pos], o)
                            c = tuple(self.find(a) for a in c)
                    self.atoms[pred].add(c)
            # remap metadata through find
            self._shape = {self.find(k): v for k, v in self._shape.items()}
            self._stats = {self.find(k): v for k, v in self._stats.items()}
            if self.n_merges == merges_before:
                break
        self._index_dirty = True  # canonical forms changed; rebuild lazily

    def classes(self) -> set[int]:
        out = set()
        for atoms in self.atoms.values():
            for args in atoms:
                out.update(self.find(a) for a in args)
        return out


# ---------------------------------------------------------------------------
# Pattern matching
# ---------------------------------------------------------------------------
def _unify(store: Store, pargs: tuple, args: tuple, bind: dict):
    nb = None
    for pa, a in zip(pargs, args):
        a = store.find(a)
        if isinstance(pa, str):
            cur = (nb or bind).get(pa)
            if cur is None:
                if nb is None:
                    nb = dict(bind)
                nb[pa] = a
            elif store.find(cur) != a:
                return None
        else:  # Cst
            cid = store._id_of_const.get(pa.value)
            if cid is None or store.find(cid) != a:
                return None
    return nb if nb is not None else dict(bind)


def match(store: Store, patterns: tuple[PAtom, ...], guard=None,
          init: dict | None = None, first_only: bool = False) -> list[dict]:
    """All homomorphisms from ``patterns`` into the store (extending ``init``)."""
    out: list[dict] = []

    def rec(i: int, bind: dict) -> bool:
        if i == len(patterns):
            if guard is None or guard(bind, store):
                out.append(bind)
                return first_only
            return False
        pat = patterns[i]
        pool = None
        for pos, pa in enumerate(pat.args):
            if isinstance(pa, str):
                if pa in bind:
                    pool = store.candidates(pat.pred, pos, bind[pa])
                    break
            else:
                cid = store._id_of_const.get(pa.value)
                if cid is None:
                    return False
                pool = store.candidates(pat.pred, pos, cid)
                break
        if pool is None:
            pool = store.atoms.get(pat.pred, ())
        for args in list(pool):
            if args not in store.atoms.get(pat.pred, ()):
                continue  # superseded by canonicalization
            nb = _unify(store, pat.args, args, bind)
            if nb is not None and rec(i + 1, nb):
                return True
        return False

    rec(0, dict(init or {}))
    return out


def match_delta(store: Store, patterns: tuple[PAtom, ...], guard,
                delta: dict[str, set] | None):
    """Semi-naive matching: homomorphisms in which at least one premise atom
    is *new* since the last round (``delta``); with ``delta=None`` behaves
    like ``match``. Deduplicates bindings that touch several new atoms."""
    if delta is None:
        yield from match(store, patterns, guard)
        return
    seen: set[tuple] = set()
    vars_ = sorted({a for p in patterns for a in p.args if isinstance(a, str)})
    for pivot in range(len(patterns)):
        pat = patterns[pivot]
        d = delta.get(pat.pred)
        if not d:
            continue
        rest = patterns[:pivot] + patterns[pivot + 1:]
        for args in list(d):
            if args not in store.atoms.get(pat.pred, ()):
                continue  # superseded by canonicalization
            bind0 = _unify(store, pat.args, args, {})
            if bind0 is None:
                continue
            for bind in match(store, rest, guard, init=bind0):
                key = tuple(store.find(bind[v]) for v in vars_)
                if key not in seen:
                    seen.add(key)
                    yield bind


def _resolve(store: Store, arg, bind: dict) -> int:
    if isinstance(arg, str):
        return bind[arg]
    return store.const(arg.value)


def _satisfied(store: Store, rule: Rule, bind: dict) -> bool:
    universal = {v: i for v, i in bind.items() if v not in rule.exist_vars}
    return bool(match(store, rule.conclusion, init=universal, first_only=True))


# ---------------------------------------------------------------------------
# Prune_prov-style pruning (§7.3)
# ---------------------------------------------------------------------------
class SizePruner:
    """Skip a TGD firing if one of the *new* intermediates it would create
    is alone more expensive than the best-known plan cost T. Mirrors the
    §7.3 example where the chase step materializing the (50K)^2 product is
    never applied. Atoms of the original expression are inserted before the
    chase, so the original plan is never lost."""

    def __init__(self, estimator, threshold: float):
        self.estimator = estimator
        self.threshold = threshold
        self.n_pruned = 0

    def should_prune(self, store: Store, rule: Rule, bind: dict) -> bool:
        for pat in rule.conclusion:
            p = PREDS[pat.pred]
            if not p.out_pos or p.name in ("name",):
                continue
            ins = []
            for i in p.in_pos:
                a = pat.args[i]
                if isinstance(a, str) and a in rule.exist_vars:
                    ins.append(None)  # chained fresh result: cannot cost yet
                elif isinstance(a, str):
                    ins.append(store.stats_of(bind.get(a)))
                else:
                    ins.append(SCALAR_STATS)
            outs = self.estimator.propagate(p.name, ins)
            for st in outs:
                if st is None:
                    continue
                charged = self.estimator.op_size(p.name, ins, st) \
                    if hasattr(self.estimator, "op_size") else st.size
                if charged > self.threshold:
                    self.n_pruned += 1
                    return True
        return False


@dataclass
class ChaseStats:
    rounds: int = 0
    fired: int = 0
    pruned: int = 0
    atoms: int = 0
    classes: int = 0
    hit_budget: bool = False


def chase(store: Store, rules: list[Rule], *, max_rounds: int = 6,
          max_atoms: int = 4000, pruner: SizePruner | None = None,
          stop_when=None, on_round=None) -> ChaseStats:
    """Run the bounded restricted chase to (budgeted) fixpoint.

    Semi-naive: after round 0 a rule only fires on matches touching at
    least one atom added (or re-canonicalized) since the previous round.
    The atom budget is enforced inside the firing loop — necessary because
    the free algebra of same-size square matrices has an infinite closure
    under the bidirectional product/inverse rules.
    """
    st = ChaseStats()
    delta: dict[str, set] | None = None  # None => full match (first round)
    for rnd in range(max_rounds):
        st.rounds = rnd + 1
        changed = False
        snapshot = {p: set(a) for p, a in store.atoms.items()}
        for rule in rules:
            if store.n_atoms > max_atoms:
                st.hit_budget = True
                break
            for bind in match_delta(store, rule.premise, rule.guard, delta):
                if rule.is_egd:
                    for x, y in rule.eqs:
                        xa = x if isinstance(x, (str, Cst)) else Cst(x)
                        ya = y if isinstance(y, (str, Cst)) else Cst(y)
                        if store.union(_resolve(store, xa, bind),
                                       _resolve(store, ya, bind)):
                            changed = True
                else:
                    if _satisfied(store, rule, bind):
                        continue
                    if pruner is not None and pruner.should_prune(store, rule, bind):
                        st.pruned += 1
                        continue
                    ext = dict(bind)
                    for v in rule.exist_vars:
                        ext[v] = store.fresh()
                    # two passes so shapes/stats of chained conclusion atoms resolve
                    for _ in range(2):
                        for pat in rule.conclusion:
                            if store.add(pat.pred,
                                         tuple(_resolve(store, a, ext) for a in pat.args)):
                                changed = True
                    st.fired += 1
                if store.n_atoms > max_atoms:
                    st.hit_budget = True
                    break
        store.rebuild()
        # delta = atoms not present (in canonical form) before this round
        delta = {}
        for pred, atoms in store.atoms.items():
            new_atoms = atoms - snapshot.get(pred, set())
            if new_atoms:
                delta[pred] = new_atoms
        if not changed or st.hit_budget:
            break
        if on_round is not None:
            on_round(store)
        if stop_when is not None and stop_when(store):
            break
    st.atoms = store.n_atoms
    st.classes = len(store.classes())
    if pruner is not None:
        st.pruned = pruner.n_pruned
    return st
