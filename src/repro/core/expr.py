"""Hybrid LA expression AST (the language ``L`` of HADAD §3).

Expressions are immutable, hash-consable dataclasses with eager shape
checking. Scalars are 1x1-shaped nodes (§3 treats numbers as degenerate
1x1 matrices), which lets SystemML rules like ``colSums(v) -> sum(v)``
type-check uniformly.

Operator sugar: ``A @ B`` (matrix product), ``A + B``, ``A - B``
(lowered to ``A + (-1)*B``), ``A * B`` (Hadamard for matrices, product
for scalars, scalar-matrix product for mixed), ``A / B`` (element-wise),
``A.T`` (transposition), plus the free functions ``inv``, ``det``,
``trace``, ``tsum``, ``rowsums``, ``colsums``, ``mexp``, ``adj``,
``diag``, ``cho``, ``qr``, ``lu``, ``cbind``, ``dsum``, ``kron``.
"""
from __future__ import annotations

import numbers
from dataclasses import dataclass, field

Shape = tuple[int, int]

#: aggregation kinds shared by RowAgg / ColAgg (SystemML rule families)
AGG_KINDS = ("sum", "min", "max", "mean", "var")


class Expr:
    """Base class. Subclasses are frozen dataclasses; ``shape`` is (rows, cols)."""

    __slots__ = ()

    # -- type predicates ---------------------------------------------------
    @property
    def shape(self) -> Shape:  # pragma: no cover - overridden
        raise NotImplementedError

    @property
    def is_scalar(self) -> bool:
        return self.shape == (1, 1) and isinstance(self, _SCALAR_NODES)

    # -- operator sugar ----------------------------------------------------
    def __matmul__(self, other: "Expr") -> "Expr":
        return MatMul(self, _as_expr(other))

    def __add__(self, other) -> "Expr":
        other = _as_expr(other)
        if self.is_scalar and other.is_scalar:
            return SAdd(self, other)
        return MAdd(self, other)

    def __sub__(self, other) -> "Expr":
        other = _as_expr(other)
        neg = SMulS(ConstS(-1.0), other) if other.is_scalar else SMul(ConstS(-1.0), other)
        return self + neg

    def __mul__(self, other) -> "Expr":
        other = _as_expr(other)
        if self.is_scalar and other.is_scalar:
            return SMulS(self, other)
        if self.is_scalar:
            return SMul(self, other)
        if other.is_scalar:
            return SMul(other, self)
        return EMul(self, other)

    def __rmul__(self, other) -> "Expr":
        return _as_expr(other) * self

    def __truediv__(self, other) -> "Expr":
        other = _as_expr(other)
        if self.is_scalar and other.is_scalar:
            return SMulS(self, SInvS(other))
        if other.is_scalar:
            return SMul(SInvS(other), self)
        return EDiv(self, other)

    @property
    def T(self) -> "Expr":
        return Tr(self)

    def children(self) -> tuple["Expr", ...]:
        return tuple(
            getattr(self, f) for f in getattr(self, "__dataclass_fields__", {})
            if isinstance(getattr(self, f), Expr)
        )

    def __str__(self) -> str:
        return to_str(self)


def _as_expr(x) -> Expr:
    if isinstance(x, Expr):
        return x
    if isinstance(x, numbers.Number):
        return ConstS(float(x))
    raise TypeError(f"not an expression: {x!r}")


def _chk(cond: bool, msg: str) -> None:
    if not cond:
        raise ValueError(msg)


# ---------------------------------------------------------------------------
# Leaves
# ---------------------------------------------------------------------------
@dataclass(frozen=True)
class Mat(Expr):
    """A named base matrix.

    ``nnz`` (non-zero count) feeds the cost estimators; ``mtype`` is the
    optional structural type of §6.2.5 ("S" symmetric positive definite,
    "L" lower-, "U" upper-triangular, "O" orthogonal, "P" permutation).
    """

    name: str
    r: int
    c: int
    nnz: int | None = None
    mtype: str | None = None

    @property
    def shape(self) -> Shape:
        return (self.r, self.c)


@dataclass(frozen=True)
class Ident(Expr):
    """k x k identity matrix."""

    k: int

    @property
    def shape(self) -> Shape:
        return (self.k, self.k)


@dataclass(frozen=True)
class ZeroM(Expr):
    """r x c zero matrix."""

    r: int
    c: int

    @property
    def shape(self) -> Shape:
        return (self.r, self.c)


@dataclass(frozen=True)
class ConstS(Expr):
    """A scalar constant."""

    value: float

    @property
    def shape(self) -> Shape:
        return (1, 1)


# ---------------------------------------------------------------------------
# Binary matrix operators
# ---------------------------------------------------------------------------
@dataclass(frozen=True)
class MatMul(Expr):
    a: Expr
    b: Expr

    def __post_init__(self):
        _chk(self.a.shape[1] == self.b.shape[0],
             f"matmul shape mismatch {self.a.shape} @ {self.b.shape}")

    @property
    def shape(self) -> Shape:
        return (self.a.shape[0], self.b.shape[1])


@dataclass(frozen=True)
class MAdd(Expr):
    a: Expr
    b: Expr

    def __post_init__(self):
        _chk(self.a.shape == self.b.shape,
             f"add shape mismatch {self.a.shape} + {self.b.shape}")

    @property
    def shape(self) -> Shape:
        return self.a.shape


@dataclass(frozen=True)
class EMul(Expr):
    """Hadamard (element-wise) product."""

    a: Expr
    b: Expr

    def __post_init__(self):
        _chk(self.a.shape == self.b.shape,
             f"hadamard shape mismatch {self.a.shape} * {self.b.shape}")

    @property
    def shape(self) -> Shape:
        return self.a.shape


@dataclass(frozen=True)
class EDiv(Expr):
    """Element-wise division."""

    a: Expr
    b: Expr

    def __post_init__(self):
        _chk(self.a.shape == self.b.shape,
             f"div shape mismatch {self.a.shape} / {self.b.shape}")

    @property
    def shape(self) -> Shape:
        return self.a.shape


@dataclass(frozen=True)
class SMul(Expr):
    """Scalar-matrix product; ``s`` must be a scalar expression."""

    s: Expr
    a: Expr

    def __post_init__(self):
        _chk(self.s.is_scalar, "SMul needs a scalar left operand")

    @property
    def shape(self) -> Shape:
        return self.a.shape


@dataclass(frozen=True)
class CBind(Expr):
    """Column concatenation [A, B] (used by Morpheus factorization)."""

    a: Expr
    b: Expr

    def __post_init__(self):
        _chk(self.a.shape[0] == self.b.shape[0],
             f"cbind row mismatch {self.a.shape} | {self.b.shape}")

    @property
    def shape(self) -> Shape:
        return (self.a.shape[0], self.a.shape[1] + self.b.shape[1])


@dataclass(frozen=True)
class SumD(Expr):
    """Direct sum: block-diagonal [[A, 0], [0, B]]."""

    a: Expr
    b: Expr

    @property
    def shape(self) -> Shape:
        return (self.a.shape[0] + self.b.shape[0], self.a.shape[1] + self.b.shape[1])


@dataclass(frozen=True)
class ProdD(Expr):
    """Direct (Kronecker) product."""

    a: Expr
    b: Expr

    @property
    def shape(self) -> Shape:
        return (self.a.shape[0] * self.b.shape[0], self.a.shape[1] * self.b.shape[1])


# ---------------------------------------------------------------------------
# Unary matrix operators
# ---------------------------------------------------------------------------
@dataclass(frozen=True)
class Tr(Expr):
    a: Expr

    @property
    def shape(self) -> Shape:
        r, c = self.a.shape
        return (c, r)


@dataclass(frozen=True)
class Inv(Expr):
    a: Expr

    def __post_init__(self):
        _chk(self.a.shape[0] == self.a.shape[1], f"inverse of non-square {self.a.shape}")

    @property
    def shape(self) -> Shape:
        return self.a.shape


@dataclass(frozen=True)
class MExp(Expr):
    """Matrix exponential."""

    a: Expr

    def __post_init__(self):
        _chk(self.a.shape[0] == self.a.shape[1], f"exp of non-square {self.a.shape}")

    @property
    def shape(self) -> Shape:
        return self.a.shape


@dataclass(frozen=True)
class Adj(Expr):
    """Adjugate (classical adjoint)."""

    a: Expr

    def __post_init__(self):
        _chk(self.a.shape[0] == self.a.shape[1], f"adjoint of non-square {self.a.shape}")

    @property
    def shape(self) -> Shape:
        return self.a.shape


@dataclass(frozen=True)
class Diag(Expr):
    """Main diagonal of a square matrix, as a column vector."""

    a: Expr

    def __post_init__(self):
        _chk(self.a.shape[0] == self.a.shape[1], f"diag of non-square {self.a.shape}")

    @property
    def shape(self) -> Shape:
        return (self.a.shape[0], 1)


@dataclass(frozen=True)
class RowAgg(Expr):
    """Row-wise aggregate (rowSums/rowMins/rowMaxs/rowMeans/rowVars): r x 1."""

    kind: str
    a: Expr

    def __post_init__(self):
        _chk(self.kind in AGG_KINDS, f"bad agg kind {self.kind}")

    @property
    def shape(self) -> Shape:
        return (self.a.shape[0], 1)


@dataclass(frozen=True)
class ColAgg(Expr):
    """Column-wise aggregate (colSums/...): 1 x c."""

    kind: str
    a: Expr

    def __post_init__(self):
        _chk(self.kind in AGG_KINDS, f"bad agg kind {self.kind}")

    @property
    def shape(self) -> Shape:
        return (1, self.a.shape[1])


# ---------------------------------------------------------------------------
# Decompositions (accessor nodes: the k-th factor of the decomposition)
# ---------------------------------------------------------------------------
@dataclass(frozen=True)
class Cho(Expr):
    """Cholesky factor L with a = L @ L.T (a symmetric positive definite)."""

    a: Expr

    @property
    def shape(self) -> Shape:
        return self.a.shape


@dataclass(frozen=True)
class QrF(Expr):
    """QR factor: part is 'Q' or 'R'."""

    a: Expr
    part: str

    def __post_init__(self):
        _chk(self.part in ("Q", "R"), "QR part must be Q or R")

    @property
    def shape(self) -> Shape:
        return self.a.shape


@dataclass(frozen=True)
class LuF(Expr):
    """LU factor: part is 'L' or 'U'."""

    a: Expr
    part: str

    def __post_init__(self):
        _chk(self.part in ("L", "U"), "LU part must be L or U")

    @property
    def shape(self) -> Shape:
        return self.a.shape


@dataclass(frozen=True)
class LupF(Expr):
    """Pivoted-LU factor: part is 'L', 'U' or 'P' (P @ a == L @ U)."""

    a: Expr
    part: str

    def __post_init__(self):
        _chk(self.part in ("L", "U", "P"), "LUP part must be L, U or P")

    @property
    def shape(self) -> Shape:
        return self.a.shape


# ---------------------------------------------------------------------------
# Scalar-producing operators and scalar arithmetic
# ---------------------------------------------------------------------------
@dataclass(frozen=True)
class Det(Expr):
    a: Expr

    def __post_init__(self):
        _chk(self.a.shape[0] == self.a.shape[1], f"det of non-square {self.a.shape}")

    @property
    def shape(self) -> Shape:
        return (1, 1)


@dataclass(frozen=True)
class Trace(Expr):
    a: Expr

    def __post_init__(self):
        _chk(self.a.shape[0] == self.a.shape[1], f"trace of non-square {self.a.shape}")

    @property
    def shape(self) -> Shape:
        return (1, 1)


@dataclass(frozen=True)
class Sum(Expr):
    """Sum of all cells. ``kind`` generalizes to min/max/mean/var (Table 11)."""

    a: Expr
    kind: str = "sum"

    def __post_init__(self):
        _chk(self.kind in ("sum", "min", "max", "mean", "var"), f"bad {self.kind}")

    @property
    def shape(self) -> Shape:
        return (1, 1)


@dataclass(frozen=True)
class SAdd(Expr):
    a: Expr
    b: Expr

    @property
    def shape(self) -> Shape:
        return (1, 1)


@dataclass(frozen=True)
class SMulS(Expr):
    a: Expr
    b: Expr

    @property
    def shape(self) -> Shape:
        return (1, 1)


@dataclass(frozen=True)
class SInvS(Expr):
    a: Expr

    @property
    def shape(self) -> Shape:
        return (1, 1)


@dataclass(frozen=True)
class SPow(Expr):
    a: Expr
    k: float

    @property
    def shape(self) -> Shape:
        return (1, 1)


_SCALAR_NODES = (ConstS, Det, Trace, Sum, SAdd, SMulS, SInvS, SPow)


# ---------------------------------------------------------------------------
# Convenience constructors (paper-flavoured names)
# ---------------------------------------------------------------------------
def mat(name: str, r: int, c: int, nnz: int | None = None, mtype: str | None = None) -> Mat:
    return Mat(name, r, c, nnz, mtype)


def inv(a: Expr) -> Expr:
    return Inv(a)


def det(a: Expr) -> Expr:
    return Det(a)


def trace(a: Expr) -> Expr:
    return Trace(a)


def tsum(a: Expr) -> Expr:
    """sum of all cells (named tsum to avoid clobbering builtins.sum)."""
    return Sum(a, "sum")


def tmin(a: Expr) -> Expr:
    return Sum(a, "min")


def tmax(a: Expr) -> Expr:
    return Sum(a, "max")


def rowsums(a: Expr, kind: str = "sum") -> Expr:
    return RowAgg(kind, a)


def colsums(a: Expr, kind: str = "sum") -> Expr:
    return ColAgg(kind, a)


def mexp(a: Expr) -> Expr:
    return MExp(a)


def adj(a: Expr) -> Expr:
    return Adj(a)


def diag(a: Expr) -> Expr:
    return Diag(a)


def cho(a: Expr) -> Expr:
    return Cho(a)


def qr(a: Expr, part: str) -> Expr:
    return QrF(a, part)


def lu(a: Expr, part: str) -> Expr:
    return LuF(a, part)


def cbind(a: Expr, b: Expr) -> Expr:
    return CBind(a, b)


def dsum(a: Expr, b: Expr) -> Expr:
    return SumD(a, b)


def kron(a: Expr, b: Expr) -> Expr:
    return ProdD(a, b)


# ---------------------------------------------------------------------------
# Traversal / pretty printing
# ---------------------------------------------------------------------------
def walk(e: Expr):
    """Yield every node of the expression tree (pre-order)."""
    yield e
    for ch in e.children():
        yield from walk(ch)


def base_matrices(e: Expr) -> dict[str, Mat]:
    """All distinct named leaves, keyed by name (shapes must agree)."""
    out: dict[str, Mat] = {}
    for n in walk(e):
        if isinstance(n, Mat):
            if n.name in out and out[n.name].shape != n.shape:
                raise ValueError(f"matrix {n.name} used with two shapes")
            out[n.name] = n
    return out


_AGGNAME = {"sum": "Sums", "min": "Mins", "max": "Maxs", "mean": "Means", "var": "Vars"}


def to_str(e: Expr) -> str:
    """Compact R-like rendering, used in reports and EXPERIMENTS.md."""
    if isinstance(e, Mat):
        return e.name
    if isinstance(e, Ident):
        return f"I{e.k}"
    if isinstance(e, ZeroM):
        return "0"
    if isinstance(e, ConstS):
        v = e.value
        return str(int(v)) if float(v).is_integer() else str(v)
    if isinstance(e, MatMul):
        return f"({to_str(e.a)} %*% {to_str(e.b)})"
    if isinstance(e, MAdd):
        # pretty-print (+ (-1)*B) as subtraction
        if isinstance(e.b, SMul) and isinstance(e.b.s, ConstS) and e.b.s.value == -1.0:
            return f"({to_str(e.a)} - {to_str(e.b.a)})"
        return f"({to_str(e.a)} + {to_str(e.b)})"
    if isinstance(e, EMul):
        return f"({to_str(e.a)} * {to_str(e.b)})"
    if isinstance(e, EDiv):
        return f"({to_str(e.a)} / {to_str(e.b)})"
    if isinstance(e, SMul):
        return f"({to_str(e.s)} . {to_str(e.a)})"
    if isinstance(e, Tr):
        return f"t({to_str(e.a)})"
    if isinstance(e, Inv):
        return f"inv({to_str(e.a)})"
    if isinstance(e, MExp):
        return f"expm({to_str(e.a)})"
    if isinstance(e, Adj):
        return f"adj({to_str(e.a)})"
    if isinstance(e, Diag):
        return f"diag({to_str(e.a)})"
    if isinstance(e, RowAgg):
        return f"row{_AGGNAME[e.kind]}({to_str(e.a)})"
    if isinstance(e, ColAgg):
        return f"col{_AGGNAME[e.kind]}({to_str(e.a)})"
    if isinstance(e, Det):
        return f"det({to_str(e.a)})"
    if isinstance(e, Trace):
        return f"trace({to_str(e.a)})"
    if isinstance(e, Sum):
        return f"{e.kind}({to_str(e.a)})"
    if isinstance(e, SAdd):
        if isinstance(e.b, SMulS) and isinstance(e.b.a, ConstS) and e.b.a.value == -1.0:
            return f"({to_str(e.a)} - {to_str(e.b.b)})"
        return f"({to_str(e.a)} + {to_str(e.b)})"
    if isinstance(e, SMulS):
        return f"({to_str(e.a)} * {to_str(e.b)})"
    if isinstance(e, SInvS):
        return f"(1 / {to_str(e.a)})"
    if isinstance(e, SPow):
        return f"({to_str(e.a)} ^ {e.k})"
    if isinstance(e, CBind):
        return f"cbind({to_str(e.a)}, {to_str(e.b)})"
    if isinstance(e, SumD):
        return f"dsum({to_str(e.a)}, {to_str(e.b)})"
    if isinstance(e, ProdD):
        return f"kron({to_str(e.a)}, {to_str(e.b)})"
    if isinstance(e, Cho):
        return f"cho({to_str(e.a)})"
    if isinstance(e, QrF):
        return f"qr({to_str(e.a)}).{e.part}"
    if isinstance(e, LuF):
        return f"lu({to_str(e.a)}).{e.part}"
    if isinstance(e, LupF):
        return f"lup({to_str(e.a)}).{e.part}"
    raise TypeError(f"unknown node {type(e)}")


def size_of(e: Expr) -> int:
    """Number of operator nodes (used to prefer smaller rewrites on cost ties)."""
    return sum(1 for n in walk(e) if n.children())
