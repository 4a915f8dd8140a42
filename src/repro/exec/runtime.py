"""Runtime helpers referenced by generated kernel code (exec.codegen).

Generated code works over plain Python data: lists (physical arrays are
converted from NumPy once, before execution — list indexing is much faster
than NumPy scalar extraction in tight Python loops), dicts (hash-maps /
tries / constructed dictionaries), and numbers.
"""
from __future__ import annotations

from repro.sdqlite.interp import PRIMITIVES  # noqa: F401  (re-exported)


def it(v):
    """Iterate a dictionary value as (key, value) pairs."""
    if isinstance(v, dict):
        return v.items()
    if isinstance(v, list):
        return enumerate(v)
    if v == 0:
        return ()
    raise TypeError(f"cannot iterate {type(v).__name__}")


def lk(d, k):
    """Lookup with missing-is-zero semantics."""
    if isinstance(d, dict):
        return d.get(k, 0)
    if isinstance(d, list):
        return d[k] if 0 <= k < len(d) else 0
    if d == 0:
        return 0
    raise TypeError(f"cannot index {type(d).__name__}")


def copy_val(v):
    """Deep-copy a nested-dict value (scalars are immutable)."""
    if isinstance(v, dict):
        return {k: copy_val(x) for k, x in v.items()}
    return v


def merge_into(dst: dict, src) -> None:
    """dst += src for nested-dict values (semiring addition, in place)."""
    for k, v in it(src):
        cur = dst.get(k)
        if cur is None:
            dst[k] = copy_val(v)
        elif isinstance(cur, dict):
            merge_into(cur, v)
        else:
            dst[k] = cur + v


def add_at(d: dict, k, v) -> None:
    """d[k] += v for a possibly-dict-valued v (semiring addition)."""
    cur = d.get(k)
    if cur is None:
        d[k] = copy_val(v)
    elif isinstance(cur, dict):
        merge_into(cur, v)
    else:
        d[k] = cur + v


def add_val(a, b):
    """Semiring addition producing a fresh value."""
    if isinstance(a, (int, float)) and a == 0:
        return copy_val(b)
    if isinstance(b, (int, float)) and b == 0:
        return copy_val(a)
    if isinstance(a, dict) or isinstance(b, dict) or isinstance(a, list) \
            or isinstance(b, list):
        out: dict = {}
        merge_into(out, a)
        merge_into(out, b)
        return out
    return a + b


def mul_val(a, b):
    """Semiring multiplication (scalar*scalar, scalar*dict, dict*dict)."""
    a_dict = isinstance(a, (dict, list))
    b_dict = isinstance(b, (dict, list))
    if not a_dict and not b_dict:
        return a * b
    if not a_dict:
        if a == 0:
            return 0
        return {k: mul_val(a, v) for k, v in it(b)}
    if not b_dict:
        if b == 0:
            return 0
        return {k: mul_val(v, b) for k, v in it(a)}
    db = b if isinstance(b, dict) else dict(it(b))
    return {k: mul_val(v, db[k]) for k, v in it(a) if k in db}


def subrange(d, lo, hi):
    """e(lo:hi) as a dict value (rarely needed outside loop fusion)."""
    return {i: lk(d, i) for i in range(lo, hi)}
