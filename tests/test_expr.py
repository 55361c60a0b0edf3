"""AST construction, operator sugar, shape checking, printing."""
import pytest

from repro.core import expr as E
from repro.core.expr import (ConstS, Mat, cbind, colsums, det, inv, mat, mexp,
                             rowsums, trace, tsum)

A = mat("A", 4, 3)
B = mat("B", 4, 3)
C = mat("C", 3, 3)
v = mat("v", 3, 1)


def test_matmul_shape():
    assert (A @ C).shape == (4, 3)


def test_matmul_mismatch_raises():
    with pytest.raises(ValueError):
        _ = A @ A


def test_add_shape_mismatch_raises():
    with pytest.raises(ValueError):
        _ = A + C


def test_transpose_shape():
    assert A.T.shape == (3, 4)


def test_hadamard_requires_same_shape():
    assert (A * B).shape == (4, 3)
    with pytest.raises(ValueError):
        _ = A * C


def test_scalar_times_matrix():
    e = 2.5 * A
    assert isinstance(e, E.SMul)
    assert e.shape == A.shape


def test_matrix_times_scalar_expr():
    e = A * det(C)
    assert isinstance(e, E.SMul) and e.s == det(C)


def test_scalar_times_scalar():
    e = det(C) * trace(C)
    assert isinstance(e, E.SMulS) and e.is_scalar


def test_subtraction_lowers_to_add():
    e = A - B
    assert isinstance(e, E.MAdd)
    assert isinstance(e.b, E.SMul) and e.b.s == ConstS(-1.0)


def test_scalar_subtraction():
    e = det(C) - trace(C)
    assert isinstance(e, E.SAdd)


def test_division_elementwise():
    assert isinstance(A / B, E.EDiv)


def test_scalar_division():
    e = det(C) / trace(C)
    assert isinstance(e, E.SMulS) and isinstance(e.b, E.SInvS)


def test_inverse_requires_square():
    with pytest.raises(ValueError):
        inv(A)
    assert inv(C).shape == (3, 3)


def test_det_trace_scalar():
    assert det(C).is_scalar and trace(C).is_scalar and tsum(A).is_scalar


def test_rowsums_colsums_shapes():
    assert rowsums(A).shape == (4, 1)
    assert colsums(A).shape == (1, 3)


def test_cbind_shape():
    assert cbind(A, B).shape == (4, 6)
    with pytest.raises(ValueError):
        cbind(A, C)


def test_mexp_square_only():
    with pytest.raises(ValueError):
        mexp(A)
    assert mexp(C).shape == (3, 3)


def test_walk_and_base_matrices():
    e = (A + B) @ v
    names = set(E.base_matrices(e))
    assert names == {"A", "B", "v"}
    assert sum(1 for _ in E.walk(e)) == 5


def test_base_matrices_shape_conflict():
    bad = mat("A", 3, 3)
    with pytest.raises(ValueError):
        E.base_matrices(cbind(A, A) @ E.MatMul(bad, bad))


def test_to_str_roundtrippable_tokens():
    s = E.to_str(tsum((A @ C).T) + det(C))
    assert "sum" in s and "t(" in s and "det(" in s


def test_sub_pretty_printed():
    assert " - " in E.to_str(A - B)


def test_size_of_counts_ops():
    assert E.size_of(A) == 0
    assert E.size_of((A + B) @ v) == 2


def test_hash_consing_equality():
    assert (A + B) == (A + B)
    assert hash(A @ C) == hash(A @ C)


def test_ident_zero_shapes():
    assert E.Ident(4).shape == (4, 4)
    assert E.ZeroM(2, 5).shape == (2, 5)


def test_qr_lu_parts():
    assert E.QrF(C, "Q").shape == (3, 3)
    with pytest.raises(ValueError):
        E.QrF(C, "X")
    with pytest.raises(ValueError):
        E.LuF(C, "Q")


def test_agg_kind_validation():
    with pytest.raises(ValueError):
        E.RowAgg("median", A)
    with pytest.raises(ValueError):
        E.Sum(A, "median")
