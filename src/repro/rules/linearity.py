"""Syntactic linearity (degree) analysis over e-classes.

``degree(eg, cid, var)`` returns 0 if the class can be written without
``var`` being multiplicatively involved (constant in var), 1 if it can be
written as a strictly linear (homogeneous degree-1) function of ``var``
under semiring semantics, and None if neither can be established.

Fusion rule F5 uses this: iterating a sum-built dictionary whose keys may
REPEAT is only fusable when the consumer body is linear in the value
variable — then grouping-before vs grouping-after commute
(f(k, a+b) = f(k,a) + f(k,b)). This is the rewrite that unlocks the
paper's CSC-driven ΣMMM factorization (Table 3's "CSC, CSR" entry).

Any syntactically-linear member of an e-class certifies the (semantic)
property for the whole class, so scanning members and taking the first
defined degree is sound. Memoization and the cycle guard are keyed by
(class, var) because ``sum`` nodes change the variable of interest (a
linear source composes with a body linear in the value variable).
"""
from __future__ import annotations


def degree(eg, cid: int, var: str) -> int | None:
    memo: dict[tuple[int, str], int | None] = {}
    visiting: set[tuple[int, str]] = set()

    def cls(c: int, v: str) -> int | None:
        c = eg.find(c)
        if v not in eg.fv[c]:
            return 0
        key = (c, v)
        if key in memo:
            return memo[key]
        if key in visiting:
            return None
        visiting.add(key)
        out = None
        for node in eg.nodes.get(c, ()):
            d = node_deg(node, v)
            if d is not None:
                out = d
                break
        visiting.discard(key)
        memo[key] = out
        return out

    def node_deg(node, v: str) -> int | None:
        op, ch = node
        kind = op[0]
        if kind == "var":
            return 1 if op[1] == v else 0
        if kind == "const":
            return 0
        if kind in ("add", "sub"):
            a, b = cls(ch[0], v), cls(ch[1], v)
            return a if a is not None and a == b else None
        if kind == "neg":
            return cls(ch[0], v)
        if kind == "mul":
            a, b = cls(ch[0], v), cls(ch[1], v)
            if a is None or b is None:
                return None
            return a + b if a + b <= 1 else None
        if kind in ("eq", "lt", "leq", "prim", "range"):
            return 0 if all(cls(c, v) == 0 for c in ch) else None
        if kind == "dict":
            if cls(ch[0], v) != 0:
                return None
            return cls(ch[1], v)
        if kind == "get":
            if cls(ch[1], v) != 0:
                return None
            return cls(ch[0], v)
        if kind == "subarr":
            if cls(ch[1], v) != 0 or cls(ch[2], v) != 0:
                return None
            return cls(ch[0], v)
        if kind == "if":
            return cls(ch[1], v) if cls(ch[0], v) == 0 else None
        if kind == "let":
            if cls(ch[0], v) == 0:
                return cls(ch[1], v)
            return None  # conservative: linear bound not composed
        if kind == "sum":
            sdeg = cls(ch[0], v)
            if sdeg == 0:
                return cls(ch[1], v)
            if sdeg == 1:
                # the body must be linear in the *value* variable, and must
                # not reference v through any other path
                body = eg.find(ch[1])
                if v in eg.fv[body]:
                    return None
                return 1 if cls(body, op[2]) == 1 else None
            return None
        if kind == "merge":
            if cls(ch[0], v) == 0 and cls(ch[1], v) == 0:
                return cls(ch[2], v)
            return None
        return None

    import sys

    old = sys.getrecursionlimit()
    sys.setrecursionlimit(max(old, 100_000))
    try:
        return cls(cid, var)
    finally:
        sys.setrecursionlimit(old)
