"""Reference interpreter for SDQLite (the paper's logical semantics, Sec. 3.2).

Values are scalars (int / float / bool) or *dictionaries*. Dictionaries are
represented as Python ``dict`` mapping int keys to values; physical arrays
may be supplied as NumPy 1-D arrays (iterated as ``{position -> element}``).
Missing keys default to the semiring zero, and a dictionary holding only
zeros is semantically the empty dictionary — use :func:`canon` before
comparing results.

This interpreter is the ground truth for every rewrite rule: rule tests
evaluate both sides on random environments and compare canonical values.
It is deliberately simple and slow; fast execution is the job of
``repro.exec.codegen`` and ``repro.exec.spark_exec``.
"""
from __future__ import annotations

import numpy as np

from repro.sdqlite.ast import (
    Add, Const, Dict, Eq, Expr, Get, If, Leq, Let, Lt, Merge, Mul, Neg,
    Prim, Range, Sub, SubArr, Sum, Var,
)


def _even_bits(d: int) -> int:
    """Extract bits 0,2,4,... of d, packed into a single integer."""
    out = bit = 0
    d = int(d)
    while d:
        out |= (d & 1) << bit
        d >>= 2
        bit += 1
    return out


def _odd_bits(d: int) -> int:
    return _even_bits(int(d) >> 1)


PRIMITIVES = {
    "even_bits": _even_bits,
    "odd_bits": _odd_bits,
    "div": lambda a, b: a // b if isinstance(a, int) and isinstance(b, int) else a / b,
    "mod": lambda a, b: a % b,
    "abs": abs,
}


def is_scalar(v) -> bool:
    return isinstance(v, (int, float, bool, np.integer, np.floating))


def entries(v):
    """Iterate a dictionary value as (key, value) pairs.

    Scalar 0 (the polymorphic zero) iterates as empty; NumPy arrays iterate
    as position -> element.
    """
    if isinstance(v, dict):
        return v.items()
    if isinstance(v, np.ndarray):
        return enumerate(v.tolist())
    if is_scalar(v) and v == 0:
        return ()
    raise TypeError(f"cannot iterate non-dictionary value {v!r}")


def lookup(v, k):
    """``v(k)`` with missing-key-is-zero semantics."""
    if isinstance(v, dict):
        return v.get(k, 0)
    if isinstance(v, np.ndarray):
        k = int(k)
        return v[k].item() if 0 <= k < len(v) else 0
    if is_scalar(v) and v == 0:
        return 0
    raise TypeError(f"cannot index non-dictionary value {v!r}")


def sr_add(a, b):
    """Semiring addition: scalars add; dictionaries add element-wise."""
    if is_scalar(a) and a == 0:
        return b
    if is_scalar(b) and b == 0:
        return a
    if is_scalar(a) and is_scalar(b):
        return a + b
    if isinstance(a, np.ndarray):
        a = dict(enumerate(a.tolist()))
    if isinstance(b, np.ndarray):
        b = dict(enumerate(b.tolist()))
    if isinstance(a, dict) and isinstance(b, dict):
        out = dict(a)
        for k, v in b.items():
            out[k] = sr_add(out[k], v) if k in out else v
        return out
    raise TypeError(f"cannot add {a!r} and {b!r}")


def sr_mul(a, b):
    """Semiring multiplication, overloaded as in the paper: scalar*scalar,
    scalar*dict (scale every value), dict*dict (element-wise on the key
    intersection, since missing keys are zero and 0*x = 0)."""
    if is_scalar(a) and is_scalar(b):
        return a * b
    if is_scalar(a):
        if a == 0:
            return 0
        return {k: sr_mul(a, v) for k, v in entries(b)}
    if is_scalar(b):
        if b == 0:
            return 0
        return {k: sr_mul(v, b) for k, v in entries(a)}
    da = a if isinstance(a, dict) else dict(entries(a))
    db = b if isinstance(b, dict) else dict(entries(b))
    return {k: sr_mul(v, db[k]) for k, v in da.items() if k in db}


def canon(v):
    """Canonical form: drop zero values recursively, unwrap NumPy scalars,
    normalize the all-zero dictionary to scalar 0."""
    if isinstance(v, np.ndarray):
        v = dict(enumerate(v.tolist()))
    if isinstance(v, dict):
        out = {}
        for k, x in v.items():
            cx = canon(x)
            if not (is_scalar(cx) and cx == 0):
                out[int(k)] = cx
        return out if out else 0
    if isinstance(v, (np.integer,)):
        return int(v)
    if isinstance(v, (np.floating,)):
        return float(v)
    if isinstance(v, bool):
        return int(v)
    return v


def approx_eq(a, b, tol: float = 1e-8) -> bool:
    """Approximate equality of canonical values (scalars / nested dicts),
    tolerant to floating-point reassociation from plan rewrites."""
    a, b = canon(a), canon(b)
    if isinstance(a, dict) and isinstance(b, dict):
        return a.keys() == b.keys() and all(
            approx_eq(a[k], b[k], tol) for k in a
        )
    if is_scalar(a) and is_scalar(b):
        return abs(a - b) <= tol * max(1.0, abs(a), abs(b))
    return False


def interp(e: Expr, env: dict) -> object:
    """Evaluate ``e`` under ``env`` (variable name -> value)."""
    if isinstance(e, Const):
        return e.value
    if isinstance(e, Var):
        if e.name not in env:
            raise NameError(f"unbound variable {e.name}")
        return env[e.name]
    if isinstance(e, Add):
        return sr_add(interp(e.a, env), interp(e.b, env))
    if isinstance(e, Mul):
        return sr_mul(interp(e.a, env), interp(e.b, env))
    if isinstance(e, Sub):
        return interp(e.a, env) - interp(e.b, env)
    if isinstance(e, Neg):
        return -interp(e.a, env)
    if isinstance(e, Eq):
        return interp(e.a, env) == interp(e.b, env)
    if isinstance(e, Lt):
        return interp(e.a, env) < interp(e.b, env)
    if isinstance(e, Leq):
        return interp(e.a, env) <= interp(e.b, env)
    if isinstance(e, Dict):
        return {int(interp(e.key, env)): interp(e.val, env)}
    if isinstance(e, Get):
        return lookup(interp(e.dict, env), int(interp(e.key, env)))
    if isinstance(e, Range):
        lo, hi = int(interp(e.lo, env)), int(interp(e.hi, env))
        return {i: i for i in range(lo, hi)}
    if isinstance(e, SubArr):
        d = interp(e.dict, env)
        lo, hi = int(interp(e.lo, env)), int(interp(e.hi, env))
        return {i: lookup(d, i) for i in range(lo, hi)}
    if isinstance(e, If):
        return interp(e.body, env) if interp(e.cond, env) else 0
    if isinstance(e, Let):
        return interp(e.body, {**env, e.name: interp(e.bound, env)})
    if isinstance(e, Sum):
        src = interp(e.source, env)
        acc = 0
        for k, v in entries(src):
            acc = sr_add(acc, interp(e.body, {**env, e.kname: k, e.vname: v}))
        return acc
    if isinstance(e, Prim):
        return PRIMITIVES[e.fn](*(interp(a, env) for a in e.args))
    if isinstance(e, Merge):
        s1, s2 = interp(e.src1, env), interp(e.src2, env)
        acc = 0
        # Semantics of merge: pairs of entries with equal *values*.
        idx2: dict[object, list] = {}
        for k2, u in entries(s2):
            idx2.setdefault(u, []).append(k2)
        for k1, y in entries(s1):
            for k2 in idx2.get(y, ()):
                acc = sr_add(
                    acc,
                    interp(
                        e.body,
                        {**env, e.k1name: k1, e.k2name: k2, e.vname: y},
                    ),
                )
        return acc
    raise TypeError(f"not an Expr: {e!r}")
