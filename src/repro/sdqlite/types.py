"""Dictionary-depth inference for SDQLite expressions.

The data model (Sec. 3.2) is nested dictionaries ``[n1) -> ... -> [nd) -> R``;
*depth* is d (0 = scalar). Because every binder name is globally unique
(ast.fresh_name), one walk over the naive plan yields a single global map
``name -> depth`` that the e-graph's depth analysis can consult for any
variable it ever encounters.
"""
from __future__ import annotations

from repro.sdqlite.ast import (
    Add, Const, Dict, Eq, Expr, Get, If, Leq, Let, Lt, Merge, Mul, Neg,
    Prim, Range, Sub, SubArr, Sum, Var,
)


def infer_var_depths(e: Expr, global_depth: dict[str, int]) -> dict[str, int]:
    """Return a map from every variable name (global and binder-introduced)
    to its dictionary depth. ``global_depth`` seeds the depths of physical
    symbols (arrays are depth 1, a d-dim hashmap/trie depth d, scalars 0).
    Unknown depths are simply absent from the result."""
    out: dict[str, int] = dict(global_depth)

    def go(x: Expr) -> int | None:
        if isinstance(x, Const):
            return 0
        if isinstance(x, Var):
            return out.get(x.name)
        if isinstance(x, (Eq, Lt, Leq, Prim)):
            for c in _kids(x):
                go(c)
            return 0
        if isinstance(x, (Add, Sub, Mul)):
            a, b = go(x.a), go(x.b)
            return max(a, b) if a is not None and b is not None else None
        if isinstance(x, Neg):
            return go(x.a)
        if isinstance(x, Dict):
            go(x.key)
            d = go(x.val)
            return d + 1 if d is not None else None
        if isinstance(x, Get):
            d = go(x.dict)
            go(x.key)
            return d - 1 if d is not None else None
        if isinstance(x, Range):
            go(x.lo), go(x.hi)
            return 1
        if isinstance(x, SubArr):
            d = go(x.dict)
            go(x.lo), go(x.hi)
            return d
        if isinstance(x, If):
            go(x.cond)
            return go(x.body)
        if isinstance(x, Let):
            d = go(x.bound)
            if d is not None:
                out[x.name] = d
            return go(x.body)
        if isinstance(x, Sum):
            ds = go(x.source)
            out[x.kname] = 0
            if ds is not None and ds >= 1:
                out[x.vname] = ds - 1
            return go(x.body)
        if isinstance(x, Merge):
            go(x.src1), go(x.src2)
            out[x.k1name] = out[x.k2name] = out[x.vname] = 0
            return go(x.body)
        raise TypeError(f"not an Expr: {x!r}")

    def _kids(x):
        from repro.sdqlite.ast import children
        return children(x)

    go(e)
    return out
