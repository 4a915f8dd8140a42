"""SDQLite abstract syntax (paper Sec. 3.2).

Expressions are immutable frozen dataclasses so they can be hash-consed by
the e-graph and used as dict keys everywhere. Binder names (``Sum.kname``,
``Sum.vname``, ``Let.name``, ``Merge.*name``) are *globally unique* strings
minted by :func:`fresh_name`; this is our substitute for the paper's
De Bruijn indices (see DESIGN.md Sec. 4): with fresh names, rules that move
a subterm across a binder are syntactic no-ops, and fusion rules rebind the
same names via ``let`` instead of substituting.
"""
from __future__ import annotations

import itertools
from dataclasses import dataclass, field


_counter = itertools.count()


def fresh_name(hint: str = "v") -> str:
    """Mint a globally unique variable name (``hint%N``)."""
    return f"{hint}%{next(_counter)}"


@dataclass(frozen=True)
class Expr:
    """Base class for all SDQLite expressions."""


@dataclass(frozen=True)
class Const(Expr):
    """A scalar literal (int, float, or bool)."""

    value: object


@dataclass(frozen=True)
class Var(Expr):
    """A variable reference: either a binder-introduced local or a global
    physical symbol (array / hash-map / scalar declared via CREATE)."""

    name: str


@dataclass(frozen=True)
class Add(Expr):
    """``e1 + e2`` — semiring addition of scalars or dictionaries."""

    a: Expr
    b: Expr


@dataclass(frozen=True)
class Mul(Expr):
    """``e1 * e2`` — overloaded: scalar*scalar, scalar*dict, dict*dict."""

    a: Expr
    b: Expr


@dataclass(frozen=True)
class Sub(Expr):
    """``e1 - e2`` (scalars only; used by the L4-L6 simplification rules)."""

    a: Expr
    b: Expr


@dataclass(frozen=True)
class Neg(Expr):
    """``-e`` (scalars only)."""

    a: Expr


@dataclass(frozen=True)
class Eq(Expr):
    """``e1 == e2`` boolean comparison of scalars."""

    a: Expr
    b: Expr


@dataclass(frozen=True)
class Lt(Expr):
    """``e1 < e2``."""

    a: Expr
    b: Expr


@dataclass(frozen=True)
class Leq(Expr):
    """``e1 <= e2``."""

    a: Expr
    b: Expr


@dataclass(frozen=True)
class Dict(Expr):
    """``{key -> val}`` — a singleton dictionary.

    ``unique`` is the paper's ``@unique`` annotation (all keys produced by
    the enclosing ``sum`` are distinct; enables fusion rule F3).
    ``phys`` is the physical representation chosen by the optimizer
    (Sec. 5.6): ``None`` (logical, cost ∞), ``"dense"`` or ``"hash"``.
    """

    key: Expr
    val: Expr
    unique: bool = False
    phys: str | None = None


@dataclass(frozen=True)
class Get(Expr):
    """``e(i)`` — dictionary lookup / array indexing."""

    dict: Expr
    key: Expr


@dataclass(frozen=True)
class Range(Expr):
    """``lo:hi`` — the dictionary { i -> i  for lo <= i < hi }."""

    lo: Expr
    hi: Expr


@dataclass(frozen=True)
class SubArr(Expr):
    """``e(lo:hi)`` — the segment { i -> e(i) for lo <= i < hi }."""

    dict: Expr
    lo: Expr
    hi: Expr


@dataclass(frozen=True)
class If(Expr):
    """``if (cond) then body`` — body if cond holds, else zero."""

    cond: Expr
    body: Expr


@dataclass(frozen=True)
class Let(Expr):
    """``let name = bound in body``."""

    name: str
    bound: Expr
    body: Expr


@dataclass(frozen=True)
class Sum(Expr):
    """``sum(<kname, vname> in source) body``."""

    kname: str
    vname: str
    source: Expr
    body: Expr


@dataclass(frozen=True)
class Prim(Expr):
    """A scalar builtin applied to scalar arguments, e.g. ``even_bits(d)``,
    ``mod(a, b)``. Opaque to the optimizer (no rules rewrite through it)."""

    fn: str
    args: tuple[Expr, ...]


@dataclass(frozen=True)
class Merge(Expr):
    """Physical operator (Sec. 5.6)::

        merge(<k1, k2, v> in <src1, src2>) body

    Iterates the pairs of entries of the int-valued vectors src1, src2
    whose *values* are equal, binding that common value to ``vname``.
    Equivalent to ``sum(<k1,y> in src1, <k2,u> in src2) if (y==u) ...``.
    """

    k1name: str
    k2name: str
    vname: str
    src1: Expr
    src2: Expr
    body: Expr


# ---------------------------------------------------------------------------
# Structural helpers
# ---------------------------------------------------------------------------

def children(e: Expr) -> tuple[Expr, ...]:
    """The sub-expressions of ``e`` in a fixed order."""
    if isinstance(e, (Const, Var)):
        return ()
    if isinstance(e, (Add, Mul, Sub, Eq, Lt, Leq)):
        return (e.a, e.b)
    if isinstance(e, Neg):
        return (e.a,)
    if isinstance(e, Dict):
        return (e.key, e.val)
    if isinstance(e, Get):
        return (e.dict, e.key)
    if isinstance(e, Range):
        return (e.lo, e.hi)
    if isinstance(e, SubArr):
        return (e.dict, e.lo, e.hi)
    if isinstance(e, If):
        return (e.cond, e.body)
    if isinstance(e, Let):
        return (e.bound, e.body)
    if isinstance(e, Sum):
        return (e.source, e.body)
    if isinstance(e, Merge):
        return (e.src1, e.src2, e.body)
    if isinstance(e, Prim):
        return e.args
    raise TypeError(f"not an Expr: {e!r}")


def bound_names(e: Expr) -> tuple[tuple[str, ...], ...]:
    """For each child (same order as :func:`children`), the names that ``e``
    binds *in that child*.  Non-binders return empty tuples."""
    if isinstance(e, Let):
        return ((), (e.name,))
    if isinstance(e, Sum):
        return ((), (e.kname, e.vname))
    if isinstance(e, Merge):
        return ((), (), (e.k1name, e.k2name, e.vname))
    return tuple(() for _ in children(e))


def free_vars(e: Expr) -> frozenset[str]:
    """The free variable names of ``e`` (globals included)."""
    if isinstance(e, Var):
        return frozenset({e.name})
    if isinstance(e, Const):
        return frozenset()
    out: set[str] = set()
    for child, bound in zip(children(e), bound_names(e)):
        out |= free_vars(child) - set(bound)
    return frozenset(out)


def rebuild(e: Expr, new_children: tuple[Expr, ...]) -> Expr:
    """Reconstruct ``e`` with replaced children (same order as children())."""
    if isinstance(e, (Const, Var)):
        return e
    if isinstance(e, (Add, Mul, Sub, Eq, Lt, Leq)):
        return type(e)(*new_children)
    if isinstance(e, Neg):
        return Neg(new_children[0])
    if isinstance(e, Dict):
        return Dict(new_children[0], new_children[1], e.unique, e.phys)
    if isinstance(e, Get):
        return Get(new_children[0], new_children[1])
    if isinstance(e, Range):
        return Range(new_children[0], new_children[1])
    if isinstance(e, SubArr):
        return SubArr(*new_children)
    if isinstance(e, If):
        return If(new_children[0], new_children[1])
    if isinstance(e, Let):
        return Let(e.name, new_children[0], new_children[1])
    if isinstance(e, Sum):
        return Sum(e.kname, e.vname, new_children[0], new_children[1])
    if isinstance(e, Merge):
        return Merge(e.k1name, e.k2name, e.vname, *new_children)
    if isinstance(e, Prim):
        return Prim(e.fn, tuple(new_children))
    raise TypeError(f"not an Expr: {e!r}")


def size(e: Expr) -> int:
    """Number of AST nodes."""
    return 1 + sum(size(c) for c in children(e))


def alpha_fresh(e: Expr, ren: dict[str, str] | None = None) -> Expr:
    """Rename every binder in ``e`` to a fresh name (free variables are
    untouched). Restores the global-uniqueness invariant on ASTs that were
    assembled by substitution and may repeat binder names."""
    ren = dict(ren or {})
    if isinstance(e, Var):
        return Var(ren.get(e.name, e.name))
    if isinstance(e, Const):
        return e
    if isinstance(e, Let):
        bound = alpha_fresh(e.bound, ren)
        ren2 = {**ren, e.name: fresh_name(e.name.split("%")[0])}
        return Let(ren2[e.name], bound, alpha_fresh(e.body, ren2))
    if isinstance(e, Sum):
        src = alpha_fresh(e.source, ren)
        ren2 = {
            **ren,
            e.kname: fresh_name(e.kname.split("%")[0]),
            e.vname: fresh_name(e.vname.split("%")[0]),
        }
        return Sum(ren2[e.kname], ren2[e.vname], src,
                   alpha_fresh(e.body, ren2))
    if isinstance(e, Merge):
        s1 = alpha_fresh(e.src1, ren)
        s2 = alpha_fresh(e.src2, ren)
        ren2 = {
            **ren,
            e.k1name: fresh_name(e.k1name.split("%")[0]),
            e.k2name: fresh_name(e.k2name.split("%")[0]),
            e.vname: fresh_name(e.vname.split("%")[0]),
        }
        return Merge(ren2[e.k1name], ren2[e.k2name], ren2[e.vname],
                     s1, s2, alpha_fresh(e.body, ren2))
    return rebuild(e, tuple(alpha_fresh(c, ren) for c in children(e)))


def subst_globals(e: Expr, mapping: dict[str, "Expr"]) -> Expr:
    """Replace free global variables by expressions (used to compose the
    tensor program with its storage mappings, Sec. 5.1). Binder names are
    globally fresh, so capture is impossible."""
    if isinstance(e, Var):
        return mapping.get(e.name, e)
    kids = tuple(subst_globals(c, mapping) for c in children(e))
    return rebuild(e, kids)


def pretty(e: Expr, indent: int = 0) -> str:
    """Human-readable rendering in (approximate) paper syntax."""
    pad = "  " * indent
    if isinstance(e, Const):
        return repr(e.value)
    if isinstance(e, Var):
        return e.name
    if isinstance(e, Add):
        return f"({pretty(e.a)} + {pretty(e.b)})"
    if isinstance(e, Mul):
        return f"({pretty(e.a)} * {pretty(e.b)})"
    if isinstance(e, Sub):
        return f"({pretty(e.a)} - {pretty(e.b)})"
    if isinstance(e, Neg):
        return f"(-{pretty(e.a)})"
    if isinstance(e, Eq):
        return f"({pretty(e.a)} == {pretty(e.b)})"
    if isinstance(e, Lt):
        return f"({pretty(e.a)} < {pretty(e.b)})"
    if isinstance(e, Leq):
        return f"({pretty(e.a)} <= {pretty(e.b)})"
    if isinstance(e, Dict):
        ann = ("@unique " if e.unique else "") + (
            f"@{e.phys} " if e.phys else ""
        )
        return f"{{{ann}{pretty(e.key)} -> {pretty(e.val)}}}"
    if isinstance(e, Get):
        return f"{pretty(e.dict)}({pretty(e.key)})"
    if isinstance(e, Range):
        return f"({pretty(e.lo)}:{pretty(e.hi)})"
    if isinstance(e, SubArr):
        return f"{pretty(e.dict)}({pretty(e.lo)}:{pretty(e.hi)})"
    if isinstance(e, If):
        return f"if ({pretty(e.cond)}) then {pretty(e.body)}"
    if isinstance(e, Let):
        return (
            f"let {e.name} = {pretty(e.bound)} in\n{pad}  "
            f"{pretty(e.body, indent + 1)}"
        )
    if isinstance(e, Sum):
        return (
            f"sum(<{e.kname},{e.vname}> in {pretty(e.source)})\n{pad}  "
            f"{pretty(e.body, indent + 1)}"
        )
    if isinstance(e, Merge):
        return (
            f"merge(<{e.k1name},{e.k2name},{e.vname}> in "
            f"<{pretty(e.src1)},{pretty(e.src2)}>)\n{pad}  "
            f"{pretty(e.body, indent + 1)}"
        )
    if isinstance(e, Prim):
        return f"{e.fn}({', '.join(pretty(a) for a in e.args)})"
    raise TypeError(f"not an Expr: {e!r}")
