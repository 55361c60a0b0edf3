"""enc_LA (§6.2.2, Example 6.1) and the pattern encoder for views."""
import pytest

from repro.core.chase import Store
from repro.core.constraints import Cst
from repro.core.encode import encode_expr, encode_patterns
from repro.core.expr import ConstS, Mat, SMul, colsums, det, inv, mat, tsum


def test_example_6_1_structure():
    """E = (MN)^T encodes to tr(R1,R2) ∧ multi_M(M,N,R1) ∧ name atoms."""
    M, N = mat("M", 100, 1), mat("N", 1, 10)
    s = Store()
    root = encode_expr((M @ N).T, s)
    assert len(s.atoms["name"]) == 2
    assert len(s.atoms["multi_M"]) == 1
    assert len(s.atoms["tr"]) == 1
    ((m, n, r1),) = s.atoms["multi_M"]
    ((r1b, r2),) = s.atoms["tr"]
    assert s.find(r1) == s.find(r1b) and s.find(r2) == s.find(root)
    assert s.shape_of(r1) == (100, 10) and s.shape_of(root) == (10, 100)


def test_same_name_merges_classes():
    """I_name as functional key: two scans of 'M' share one class."""
    M = mat("M", 4, 4)
    s = Store()
    r1 = encode_expr(M @ M, s)
    assert len(s.atoms["name"]) == 1


def test_hash_consing_shares_subexpressions():
    M = mat("M", 4, 4)
    s = Store()
    encode_expr((M @ M) + (M @ M), s)
    assert len(s.atoms["multi_M"]) == 1  # both operands hit the same class


def test_scalar_constants_interned():
    s = Store()
    e = SMul(ConstS(2.0), mat("A", 3, 3)) + SMul(ConstS(2.0), mat("B", 3, 3))
    encode_expr(e, s)
    consts = [v for v in s.const_of.values() if v == 2.0]
    assert len(consts) == 1


def test_mtype_emits_type_atom():
    s = Store()
    encode_expr(mat("S", 3, 3, mtype="S"), s)
    ((mid, tid),) = s.atoms["type"]
    assert s.const_of[s.find(tid)] == "S"


def test_scalar_ops_encode():
    s = Store()
    C = mat("C", 3, 3)
    encode_expr(det(C) * det(C) + tsum(C), s)
    assert len(s.atoms["det"]) == 1
    assert len(s.atoms["multi_S"]) == 1
    assert len(s.atoms["add_S"]) == 1


def test_pattern_encoding_consts_are_wrapped():
    root, atoms = encode_patterns(inv(mat("D", 3, 3)))
    name_atoms = [a for a in atoms if a.pred == "name"]
    assert name_atoms and isinstance(name_atoms[0].args[1], Cst)
    assert name_atoms[0].args[1].value == "D"
    assert isinstance(root, str)


def test_pattern_encoding_shares_subexpr_vars():
    M = mat("M", 4, 4)
    root, atoms = encode_patterns((M @ M) + colsums(M @ M).T @ colsums(M))
    mm = [a for a in atoms if a.pred == "multi_M"]
    # M@M appears once thanks to memoization (plus the tr-colsums product)
    assert len([a for a in mm if a.args[0] == a.args[1]]) == 1


def test_qr_encoding_two_outputs():
    from repro.core.expr import qr
    s = Store()
    C = mat("C", 3, 3)
    rq = encode_expr(qr(C, "Q"), s)
    rr = encode_expr(qr(C, "R"), s)
    assert len(s.atoms["QR"]) == 1
    ((m, q, r),) = s.atoms["QR"]
    assert s.find(q) == s.find(rq) and s.find(r) == s.find(rr)
