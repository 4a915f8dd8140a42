"""Patterns, e-matching, and guarded rewrite rules.

A pattern is a tree of :class:`P` (operator nodes) and :class:`PVar`
(pattern variables matching whole e-classes). Operator payloads (constant
values, variable/binder names, ``@unique``/physical flags) are matched
element-wise: a payload entry that is a string starting with ``?`` binds a
payload variable; the literal string ``"_"`` matches anything without
binding; anything else must compare equal.

A :class:`Rule` pairs an LHS pattern with either an RHS pattern or a
builder callable ``(subst, egraph) -> class_id`` for rules whose RHS is not
expressible as a static template (e.g. fusion rules that assemble nested
lets). An optional ``guard(subst, egraph) -> bool`` implements the paper's
side conditions ("k, v not in FV(e2)") via the e-graph's FV analysis.
"""
from __future__ import annotations

from dataclasses import dataclass, field
from typing import Callable, Iterator


@dataclass(frozen=True)
class PVar:
    """Matches any e-class; binds its canonical id to ``name``."""

    name: str


@dataclass(frozen=True)
class P:
    """Matches e-nodes with operator ``op`` and the given payload/children."""

    op: str
    children: tuple = ()
    payload: tuple = ()

    def __init__(self, op: str, *children, payload: tuple = ()):  # noqa: D401
        object.__setattr__(self, "op", op)
        object.__setattr__(self, "children", tuple(children))
        object.__setattr__(self, "payload", tuple(payload))


Pattern = P | PVar


def _match_payload(actual: tuple, pat: tuple, subst: dict) -> dict | None:
    if len(actual) != len(pat):
        return None
    out = dict(subst)
    for a, p in zip(actual, pat):
        if isinstance(p, str) and p.startswith("?"):
            if p in out:
                if out[p] != a:
                    return None
            else:
                out[p] = a
        elif p == "_":
            continue
        elif p != a:
            return None
    return out


def match(pat: Pattern, cid: int, eg, subst: dict) -> Iterator[dict]:
    """Yield all substitutions extending ``subst`` that make ``pat`` match
    e-class ``cid``."""
    cid = eg.find(cid)
    if isinstance(pat, PVar):
        if pat.name in subst:
            if eg.find(subst[pat.name]) == cid:
                yield subst
        else:
            yield {**subst, pat.name: cid}
        return
    for node in list(eg.nodes.get(cid, ())):
        op, ch = node
        if op[0] != pat.op or len(ch) != len(pat.children):
            continue
        s0 = _match_payload(op[1:], pat.payload, subst)
        if s0 is None:
            continue
        yield from _match_children(pat.children, ch, eg, s0)


def _match_children(pats, cids, eg, subst) -> Iterator[dict]:
    if not pats:
        yield subst
        return
    for s in match(pats[0], cids[0], eg, subst):
        yield from _match_children(pats[1:], cids[1:], eg, s)


def instantiate(pat: Pattern, subst: dict, eg) -> int:
    """Build the RHS pattern in the e-graph, returning its class id."""
    if isinstance(pat, PVar):
        return eg.find(subst[pat.name])
    payload = tuple(
        subst[p] if isinstance(p, str) and p.startswith("?") else p
        for p in pat.payload
    )
    kids = tuple(instantiate(c, subst, eg) for c in pat.children)
    return eg.add((pat.op,) + payload, kids)


@dataclass
class Rule:
    """A guarded rewrite rule LHS -> RHS."""

    name: str
    lhs: Pattern
    rhs: object  # Pattern | Callable[[dict, EGraph], int]
    guard: Callable | None = None

    def search(self, eg) -> list[tuple[int, dict]]:
        """All (root class id, substitution) matches in the e-graph."""
        out = []
        if isinstance(self.lhs, PVar):
            raise ValueError("LHS cannot be a bare pattern variable")
        for cid in {c for c, _n in eg.classes_by_op(self.lhs.op)}:
            for s in match(self.lhs, cid, eg, {}):
                if self.guard is None or self.guard(s, eg):
                    out.append((cid, s))
        return out

    def apply(self, cid: int, subst: dict, eg) -> bool:
        """Instantiate the RHS and merge it with the matched class.
        Returns True if the e-graph changed."""
        before = eg.version
        if callable(self.rhs):
            new_id = self.rhs(subst, eg)
        else:
            new_id = instantiate(self.rhs, subst, eg)
        if new_id is not None:
            eg.merge(cid, new_id)
        return eg.version != before


def fv_guard(*var_payloads: str, of: str):
    """Guard builder: the binder names bound to ``var_payloads`` must not be
    free in the class bound to pattern variable ``of``.

    Example: ``fv_guard("?k", "?v", of="e2")`` implements the paper's
    side-condition "k, v not in FV(e2)" of rules D2-D4/F1/F4.
    """

    def g(subst: dict, eg) -> bool:
        names = {subst[v] for v in var_payloads}
        return not (names & eg.fv[eg.find(subst[of])])

    return g
