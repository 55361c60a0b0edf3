"""Chase engine unit tests: union-find, congruence, TGD/EGD application,
restricted-chase satisfaction, Prune_prov pruning (§4.2, §7.3)."""
import pytest

from repro.core.chase import (Inconsistent, SizePruner, Store, chase, match,
                              match_delta)
from repro.core.constraints import A, Cst, Rule, egd, square, tgd
from repro.core.cost import NaiveEstimator, gamma
from repro.core.encode import encode_expr
from repro.core.expr import mat
from repro.core.properties import la_property_rules, mmc_m_rules
from repro.core.rewriter import default_rules


def test_union_find_basics():
    s = Store()
    a, b, c = s.fresh(), s.fresh(), s.fresh()
    s.union(a, b)
    assert s.find(a) == s.find(b) != s.find(c)


def test_const_becomes_representative():
    s = Store()
    a = s.fresh()
    c = s.const(3.0)
    s.union(a, c)
    assert s.find(a) == c


def test_equating_distinct_constants_raises():
    s = Store()
    with pytest.raises(Inconsistent):
        s.union(s.const(1.0), s.const(2.0))


def test_functional_index_merges_outputs():
    """I_multi_M: multi_M(M,N,R1) ∧ multi_M(M,N,R2) -> R1 = R2."""
    s = Store()
    m, n, r1, r2 = s.fresh(), s.fresh(), s.fresh(), s.fresh()
    s.add("multi_M", (m, n, r1))
    s.add("multi_M", (m, n, r2))
    assert s.find(r1) == s.find(r2)
    assert len(s.atoms["multi_M"]) == 1


def test_rebuild_congruence_closure():
    """Merging inputs must merge outputs transitively."""
    s = Store()
    m1, m2, n, r1, r2 = (s.fresh() for _ in range(5))
    s.add("multi_M", (m1, n, r1))
    s.add("multi_M", (m2, n, r2))
    s.union(m1, m2)
    s.rebuild()
    assert s.find(r1) == s.find(r2)


def test_shape_clash_on_merge_raises():
    s = Store()
    a, b = s.fresh(), s.fresh()
    s.set_shape(a, (2, 3))
    s.set_shape(b, (3, 3))
    with pytest.raises(Inconsistent):
        s.union(a, b)


def test_match_with_constants():
    s = Store()
    m = s.fresh()
    s.add("name", (m, s.const("X")))
    assert match(s, (A("name", "M", Cst("X")),))
    assert not match(s, (A("name", "M", Cst("Y")),))


def test_match_delta_only_new_atoms():
    s = Store()
    m, n, r = s.fresh(), s.fresh(), s.fresh()
    s.add("multi_M", (m, n, r))
    pats = (A("multi_M", "M", "N", "R"),)
    assert list(match_delta(s, pats, None, {"multi_M": set()})) == []
    assert len(list(match_delta(s, pats, None, None))) == 1
    assert len(list(match_delta(s, pats, None,
                                {"multi_M": set(s.atoms["multi_M"])}))) == 1


def test_tgd_restricted_chase_is_idempotent():
    s = Store()
    m, n, r = s.fresh(), s.fresh(), s.fresh()
    s.add("add_M", (m, n, r))
    comm = tgd("comm", [A("add_M", "M", "N", "R")], [A("add_M", "N", "M", "R")])
    st1 = chase(s, comm)
    atoms_after = set(s.atoms["add_M"])
    st2 = chase(s, comm)
    assert set(s.atoms["add_M"]) == atoms_after
    assert len(atoms_after) == 2


def test_egd_with_constant_value():
    s = Store()
    i, d = s.fresh(), s.fresh()
    s.add("Identity", (i,))
    s.set_shape(i, (3, 3))
    s.add("det", (i, d))
    chase(s, egd("det_iden", [A("Identity", "I"), A("det", "I", "d")],
                 [("d", 1.0)]))
    assert s.const_of.get(s.find(d)) == 1.0


def test_guard_blocks_application():
    s = Store()
    m, r = s.fresh(), s.fresh()
    s.set_shape(m, (2, 3))
    s.add("tr", (m, r))
    rule = tgd("sq_only", [A("tr", "M", "R")], [A("inv_M", "M", "X")],
               guard=square("M"))
    chase(s, rule)
    assert not s.atoms.get("inv_M")


def test_existentials_get_fresh_classes():
    s = Store()
    m, n, r1, r2 = (s.fresh() for _ in range(4))
    for i, sh in [(m, (4, 3)), (n, (3, 4))]:
        s.set_shape(i, sh)
    s.add("multi_M", (m, n, r1))
    s.add("tr", (r1, r2))
    rules = [r for r in la_property_rules() if r.name == "tr_mul"]
    chase(s, rules)
    assert len(s.atoms["tr"]) == 3    # tr(R1), tr(M), tr(N)
    assert len(s.atoms["multi_M"]) == 2


def test_prune_prov_blocks_expensive_chase_step():
    """Example 7.2: for E = M(NM) the reassociation to (MN)M would create a
    50K^2-sized atom and is pruned under threshold T = γ(E)."""
    M = mat("M", 500, 10)   # stand-in for 50K x 100
    N = mat("N", 10, 500)
    est = NaiveEstimator()
    e = M @ (N @ M)
    s = Store(estimator=est)
    encode_expr(e, s)
    pruner = SizePruner(est, threshold=max(gamma(e, est), 500 * 10))
    chase(s, default_rules(), pruner=pruner)
    big = [a for a in s.atoms["multi_M"]
           if s.shape_of(a[2]) == (500, 500)]
    assert not big, "the (MN) grouping should be pruned"
    assert pruner.n_pruned > 0


def test_without_pruning_both_groupings_exist():
    M = mat("M", 500, 10)
    N = mat("N", 10, 500)
    s = Store(estimator=NaiveEstimator())
    encode_expr(M @ (N @ M), s)
    chase(s, default_rules())
    big = [a for a in s.atoms["multi_M"] if s.shape_of(a[2]) == (500, 500)]
    assert big


def test_atom_budget_halts():
    C = mat("C", 8, 8)
    D = mat("D", 8, 8)
    from repro.core.expr import inv
    s = Store(estimator=NaiveEstimator())
    encode_expr((D @ inv(D)) @ C, s)
    st = chase(s, default_rules(), max_atoms=60)
    assert st.hit_budget and s.n_atoms <= 60 + 12  # may overshoot one firing


def test_identity_merge_rule():
    s = Store()
    i1, i2 = s.fresh(), s.fresh()
    s.set_shape(i1, (4, 4))
    s.set_shape(i2, (4, 4))
    s.add("Identity", (i1,))
    s.add("Identity", (i2,))
    chase(s, mmc_m_rules())
    assert s.find(i1) == s.find(i2)
