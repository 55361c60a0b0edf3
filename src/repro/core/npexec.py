"""Numpy reference executor for LA expressions.

Ground truth for the whole reproduction: every constraint in the rule
library and every rewrite the engine emits is checked for numeric
equivalence against this executor. Matrices are dense ndarrays; scalar
nodes evaluate to python floats.
"""
from __future__ import annotations

import numpy as np

from . import expr as E


def _lu_nopivot(a: np.ndarray) -> tuple[np.ndarray, np.ndarray]:
    """Doolittle LU without pivoting (tests use diagonally dominant inputs)."""
    n = a.shape[0]
    L = np.eye(n)
    U = a.astype(float).copy()
    for k in range(n - 1):
        for i in range(k + 1, n):
            f = U[i, k] / U[k, k]
            L[i, k] = f
            U[i, k:] -= f * U[k, k:]
            U[i, k] = 0.0
    return L, np.triu(U)


def _lup(a: np.ndarray) -> tuple[np.ndarray, np.ndarray, np.ndarray]:
    """Partial-pivoting LU: returns (L, U, P) with P @ a == L @ U."""
    n = a.shape[0]
    U = a.astype(float).copy()
    L = np.eye(n)
    P = np.eye(n)
    for k in range(n - 1):
        p = int(np.argmax(np.abs(U[k:, k]))) + k
        if p != k:
            U[[k, p], :] = U[[p, k], :]
            P[[k, p], :] = P[[p, k], :]
            if k > 0:
                L[[k, p], :k] = L[[p, k], :k]
        for i in range(k + 1, n):
            f = U[i, k] / U[k, k]
            L[i, k] = f
            U[i, k:] -= f * U[k, k:]
            U[i, k] = 0.0
    return L, np.triu(U), P


def _expm(a: np.ndarray) -> np.ndarray:
    """Matrix exponential by scaling-and-squaring + Taylor (no scipy offline)."""
    norm = np.linalg.norm(a, ord=np.inf)
    k = max(0, int(np.ceil(np.log2(max(norm, 1e-300)))) + 1) if norm > 0.5 else 0
    s = a / (2.0**k)
    out = np.eye(a.shape[0])
    term = np.eye(a.shape[0])
    for i in range(1, 30):
        term = term @ s / i
        out = out + term
    for _ in range(k):
        out = out @ out
    return out


_ROW_AGG = {
    "sum": lambda a: a.sum(axis=1, keepdims=True),
    "min": lambda a: a.min(axis=1, keepdims=True),
    "max": lambda a: a.max(axis=1, keepdims=True),
    "mean": lambda a: a.mean(axis=1, keepdims=True),
    "var": lambda a: a.var(axis=1, keepdims=True),
}
_FULL_AGG = {
    "sum": np.sum, "min": np.min, "max": np.max, "mean": np.mean, "var": np.var,
}


def as_float(x) -> float:
    """Scalar coercion: a 1x1 ndarray in a scalar position collapses to its
    value (§3: numbers are degenerate 1x1 matrices)."""
    if isinstance(x, np.ndarray):
        if x.size != 1:
            raise ValueError(f"expected scalar, got array of shape {x.shape}")
        return float(x.reshape(-1)[0])
    return float(x)


def eval_np(e: E.Expr, env: dict[str, np.ndarray]):
    """Evaluate ``e``; matrix nodes -> ndarray, scalar nodes -> float.

    Matrix positions coerce scalar children to 1x1 arrays (§3: numbers
    are degenerate 1x1 matrices, and the rewriter may place a scalar
    class where a 1x1 matrix is expected).
    """
    ev = lambda x: eval_np(x, env)  # noqa: E731
    em = lambda x: np.atleast_2d(eval_np(x, env))  # noqa: E731
    if isinstance(e, E.Mat):
        a = env[e.name]
        if a.shape != e.shape:
            raise ValueError(f"env[{e.name}] has shape {a.shape}, expr says {e.shape}")
        return a
    if isinstance(e, E.Ident):
        return np.eye(e.k)
    if isinstance(e, E.ZeroM):
        return np.zeros((e.r, e.c))
    if isinstance(e, E.ConstS):
        return float(e.value)
    if isinstance(e, E.MatMul):
        return em(e.a) @ em(e.b)
    if isinstance(e, E.MAdd):
        return em(e.a) + em(e.b)
    if isinstance(e, E.EMul):
        return em(e.a) * em(e.b)
    if isinstance(e, E.EDiv):
        return em(e.a) / em(e.b)
    if isinstance(e, E.SMul):
        return as_float(ev(e.s)) * em(e.a)
    if isinstance(e, E.Tr):
        return em(e.a).T
    if isinstance(e, E.Inv):
        return np.linalg.inv(em(e.a))
    if isinstance(e, E.MExp):
        return _expm(em(e.a))
    if isinstance(e, E.Adj):
        a = em(e.a)
        return np.linalg.det(a) * np.linalg.inv(a)
    if isinstance(e, E.Diag):
        return np.diag(em(e.a)).reshape(-1, 1)
    if isinstance(e, E.RowAgg):
        return _ROW_AGG[e.kind](em(e.a))
    if isinstance(e, E.ColAgg):
        return _ROW_AGG[e.kind](em(e.a).T).T
    if isinstance(e, E.Det):
        return float(np.linalg.det(em(e.a)))
    if isinstance(e, E.Trace):
        return float(np.trace(em(e.a)))
    if isinstance(e, E.Sum):
        return float(_FULL_AGG[e.kind](em(e.a)))
    if isinstance(e, E.SAdd):
        return as_float(ev(e.a)) + as_float(ev(e.b))
    if isinstance(e, E.SMulS):
        return as_float(ev(e.a)) * as_float(ev(e.b))
    if isinstance(e, E.SInvS):
        return 1.0 / as_float(ev(e.a))
    if isinstance(e, E.SPow):
        return as_float(ev(e.a)) ** e.k
    if isinstance(e, E.CBind):
        return np.hstack([em(e.a), em(e.b)])
    if isinstance(e, E.SumD):
        a, b = em(e.a), em(e.b)
        out = np.zeros((a.shape[0] + b.shape[0], a.shape[1] + b.shape[1]))
        out[: a.shape[0], : a.shape[1]] = a
        out[a.shape[0]:, a.shape[1]:] = b
        return out
    if isinstance(e, E.ProdD):
        return np.kron(em(e.a), em(e.b))
    if isinstance(e, E.Cho):
        return np.linalg.cholesky(em(e.a))
    if isinstance(e, E.QrF):
        q, r = np.linalg.qr(em(e.a))
        return q if e.part == "Q" else r
    if isinstance(e, E.LuF):
        L, U = _lu_nopivot(em(e.a))
        return L if e.part == "L" else U
    if isinstance(e, E.LupF):
        L, U, P = _lup(em(e.a))
        return {"L": L, "U": U, "P": P}[e.part]
    raise TypeError(f"cannot evaluate {type(e)}")


# ---------------------------------------------------------------------------
# Deterministic random material for base matrices (tests / harness)
# ---------------------------------------------------------------------------
def rand_for(m: E.Mat, seed: int = 0) -> np.ndarray:
    """Random ndarray honouring shape, nnz (sparsity) and mtype of a leaf."""
    g = np.random.default_rng(abs(hash((m.name, m.r, m.c, seed))) % (2**32))
    r, c = m.r, m.c
    if m.mtype == "S":  # symmetric positive definite
        a = g.standard_normal((r, r))
        return a @ a.T / r + np.eye(r) * (r * 0.1 + 1.0)
    if m.mtype == "L":
        return np.tril(g.standard_normal((r, c))) + np.eye(r) * r
    if m.mtype == "U":
        return np.triu(g.standard_normal((r, c))) + np.eye(r) * r
    if m.mtype == "O":
        q, _ = np.linalg.qr(g.standard_normal((r, r)))
        return q
    a = g.standard_normal((r, c))
    if r == c:
        # keep square matrices comfortably invertible for inv/det pipelines
        a = a / np.sqrt(r) + np.eye(r) * 2.0
    if m.nnz is not None and m.nnz < r * c:
        mask = np.zeros(r * c, dtype=bool)
        idx = g.choice(r * c, size=max(1, int(m.nnz)), replace=False)
        mask[idx] = True
        a = a * mask.reshape(r, c)
    return a


def env_for(e: E.Expr, seed: int = 0) -> dict[str, np.ndarray]:
    """Build a random environment binding every base matrix of ``e``."""
    return {name: rand_for(m, seed) for name, m in E.base_matrices(e).items()}
