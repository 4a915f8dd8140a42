"""The cardinality-expression algebra of paper Fig. 5.

Grammar: ``c := s | n[c]`` — ``s`` means scalar (size 1), ``n[c]`` means
an estimated ``n`` non-zero entries whose values each have cardinality
``c``. (The paper's ``#m`` symbolic sizes are resolved to numbers here,
since our harness supplies concrete statistics.)

Represented as nested tuples: ``S`` is the scalar marker; ``(n, inner)``
is ``n[inner]``. E.g. the paper's ``100[10[50[s]]]`` is
``seq(100, seq(10, seq(50, S)))``.
"""
from __future__ import annotations

S = "s"  # the scalar cardinality
Card = object  # S | tuple[float, Card]


def seq(n: float, inner: Card = S) -> Card:
    """``n[inner]``."""
    return (float(max(n, 0.0)), inner)


def is_scalar(c: Card) -> bool:
    return c == S


def outer(c: Card) -> float:
    """size(e): the outermost entry count (1 for scalars)."""
    return 1.0 if c == S else c[0]


def inner(c: Card) -> Card:
    """The cardinality of a value obtained by one lookup, e(i)."""
    return S if c == S else c[1]


def total(c: Card) -> float:
    """Total number of leaf entries (product of all level counts)."""
    t = 1.0
    while c != S:
        t *= c[0]
        c = c[1]
    return t


def depth(c: Card) -> int:
    d = 0
    while c != S:
        d += 1
        c = c[1]
    return d


def scale(c: Card, factor: float) -> Card:
    """Multiply the outermost count (Fig. 5: summation/selection scaling).
    Scaling a scalar keeps it scalar — summing n scalars is a scalar."""
    if c == S:
        return S
    return (c[0] * factor, c[1])


def card_add(a: Card, b: Card) -> Card:
    """e1 + e2: entry counts add at every level (an upper bound)."""
    if a == S or b == S:
        return a if b == S else b
    return (a[0] + b[0], card_add(a[1], b[1]))


def card_mul(a: Card, b: Card) -> Card:
    """e1 * e2: scalar factors keep the dict's shape; dict*dict intersects
    (missing keys are zero), estimated by the smaller count per level."""
    if a == S:
        return b
    if b == S:
        return a
    return (min(a[0], b[0]), card_mul(a[1], b[1]))


def card_dict(val: Card) -> Card:
    """{k -> e}: one entry whose value has e's cardinality."""
    return (1.0, val)


def pretty(c: Card) -> str:
    if c == S:
        return "s"
    n, i = c
    return f"{n:g}[{pretty(i)}]"
