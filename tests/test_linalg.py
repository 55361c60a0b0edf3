"""Spark COO operators vs numpy and vs the DuckDB oracle.

The oracle checks run the COO algebra as SQL over the (i, j, v)
relations — a wrong join key or aggregation in the Spark operator is a
wrong answer here, not just a crash.
"""
import numpy as np
import pandas as pd
import pytest

from repro.linalg import ops
from repro.linalg.coo import from_numpy, identity
from repro.linalg import local
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def mats(spark):
    g = np.random.default_rng(42)
    a = g.standard_normal((12, 8)).round(3)
    b = g.standard_normal((8, 9)).round(3)
    c = g.standard_normal((12, 8)).round(3)
    sp = (g.random((12, 8)) < 0.25) * g.standard_normal((12, 8)).round(3)
    sq = g.standard_normal((8, 8)).round(3) + np.eye(8) * 4
    return {
        "a": (a, from_numpy(spark, a)),
        "b": (b, from_numpy(spark, b)),
        "c": (c, from_numpy(spark, c)),
        "sp": (sp, from_numpy(spark, sp)),
        "sq": (sq, from_numpy(spark, sq)),
    }


def _pdf(m) -> pd.DataFrame:
    return m.df.toPandas()


def test_roundtrip_numpy(mats):
    a, A = mats["a"]
    np.testing.assert_allclose(A.to_numpy(), a)


def test_matmul_vs_numpy(mats):
    (a, A), (b, B) = mats["a"], mats["b"]
    np.testing.assert_allclose(ops.matmul(A, B).to_numpy(), a @ b, rtol=1e-9)


def test_matmul_vs_oracle(spark, mats):
    (_, A), (_, B) = mats["a"], mats["b"]
    out = ops.matmul(A, B).df
    assert_equivalent(
        out,
        """SELECT a.i AS i, b.j AS j, SUM(a.v * b.v) AS v
           FROM a JOIN b ON a.j = b.i GROUP BY a.i, b.j""",
        a=_pdf(A), b=_pdf(B))


def test_add_vs_oracle(spark, mats):
    (_, A), (_, C) = mats["a"], mats["c"]
    out = ops.add(A, C).df
    assert_equivalent(
        out,
        """SELECT i, j, SUM(v) AS v FROM (
             SELECT * FROM a UNION ALL SELECT * FROM c)
           GROUP BY i, j HAVING SUM(v) <> 0""",
        a=_pdf(A), c=_pdf(C))


def test_add_scaled_vs_numpy(mats):
    (a, A), (c, C) = mats["a"], mats["c"]
    np.testing.assert_allclose(ops.add(A, C, 2.0, -1.0).to_numpy(),
                               2 * a - c, rtol=1e-9)


def test_emul_vs_oracle(spark, mats):
    (_, A), (_, S) = mats["a"], mats["sp"]
    out = ops.emul(A, S).df
    assert_equivalent(
        out,
        """SELECT a.i AS i, a.j AS j, a.v * s.v AS v
           FROM a JOIN s ON a.i = s.i AND a.j = s.j""",
        a=_pdf(A), s=_pdf(S))


def test_ediv_vs_numpy(mats):
    (sp, S), (a, A) = mats["sp"], mats["a"]
    got = ops.ediv(S, A).to_numpy()
    ref = np.where(sp != 0, sp / a, 0.0)
    np.testing.assert_allclose(got, ref, rtol=1e-9)


def test_smul_transpose(mats):
    a, A = mats["a"]
    np.testing.assert_allclose(ops.smul(-2.5, A).to_numpy(), -2.5 * a)
    np.testing.assert_allclose(ops.transpose(A).to_numpy(), a.T)


@pytest.mark.parametrize("kind", ["sum", "min", "max", "mean", "var"])
def test_rowagg_vs_numpy(mats, kind):
    sp, S = mats["sp"]  # sparse input exercises the implicit-zero handling
    got = ops.rowagg(S, kind).to_numpy().ravel()
    ref = {"sum": np.sum, "min": np.min, "max": np.max,
           "mean": np.mean, "var": np.var}[kind](sp, axis=1)
    np.testing.assert_allclose(got, ref, rtol=1e-9, atol=1e-12)


@pytest.mark.parametrize("kind", ["sum", "min", "max", "mean", "var"])
def test_colagg_vs_numpy(mats, kind):
    sp, S = mats["sp"]
    got = ops.colagg(S, kind).to_numpy().ravel()
    ref = {"sum": np.sum, "min": np.min, "max": np.max,
           "mean": np.mean, "var": np.var}[kind](sp, axis=0)
    np.testing.assert_allclose(got, ref, rtol=1e-9, atol=1e-12)


def test_rowsums_vs_oracle(spark, mats):
    _, S = mats["sp"]
    out = ops.rowagg(S, "sum").df
    assert_equivalent(
        out,
        """SELECT i, CAST(0 AS BIGINT) AS j, SUM(v) AS v
           FROM s GROUP BY i HAVING SUM(v) <> 0""",
        s=_pdf(S))


@pytest.mark.parametrize("kind", ["sum", "min", "max", "mean", "var"])
def test_full_agg_vs_numpy(mats, kind):
    sp, S = mats["sp"]
    ref = {"sum": np.sum, "min": np.min, "max": np.max,
           "mean": np.mean, "var": np.var}[kind](sp)
    assert ops.full_agg(S, kind) == pytest.approx(ref, rel=1e-9, abs=1e-12)


def test_trace_diag(mats):
    sq, Q = mats["sq"]
    assert ops.trace(Q) == pytest.approx(np.trace(sq))
    np.testing.assert_allclose(ops.diag(Q).to_numpy().ravel(), np.diag(sq))


def test_cbind_dsum(mats):
    (a, A), (c, C) = mats["a"], mats["c"]
    np.testing.assert_allclose(ops.cbind(A, C).to_numpy(), np.hstack([a, c]))
    ds = ops.dsum(A, C).to_numpy()
    assert ds.shape == (24, 16)
    np.testing.assert_allclose(ds[:12, :8], a)
    np.testing.assert_allclose(ds[12:, 8:], c)


def test_kron(spark):
    g = np.random.default_rng(1)
    a, b = g.random((3, 2)), g.random((2, 4))
    A, B = from_numpy(spark, a), from_numpy(spark, b)
    np.testing.assert_allclose(ops.kron(A, B).to_numpy(), np.kron(a, b))


def test_identity_builder(spark):
    np.testing.assert_allclose(identity(spark, 5).to_numpy(), np.eye(5))


def test_filter_values(spark, mats):
    sp, S = mats["sp"]
    from pyspark.sql import functions as F
    got = ops.filter_values(S, lambda v: v > 0).to_numpy()
    np.testing.assert_allclose(got, np.where(sp > 0, sp, 0.0))


def test_local_inverse_det(mats):
    sq, Q = mats["sq"]
    np.testing.assert_allclose(local.inverse(Q).to_numpy(),
                               np.linalg.inv(sq), rtol=1e-8)
    assert local.determinant(Q) == pytest.approx(np.linalg.det(sq), rel=1e-9)


def test_local_guard_rejects_huge(spark, monkeypatch):
    monkeypatch.setattr(local, "LOCAL_MAX_CELLS", 10)
    _, Q = spark, None
    with pytest.raises(ValueError):
        local.inverse(from_numpy(spark, np.eye(5)))


def test_shape_mismatch_errors(mats):
    (_, A), (_, B) = mats["a"], mats["b"]
    with pytest.raises(ValueError):
        ops.add(A, B)
    with pytest.raises(ValueError):
        ops.matmul(A, A)
    with pytest.raises(ValueError):
        ops.trace(A)
