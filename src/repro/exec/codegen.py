"""Python code generation for optimized physical plans.

The paper executes its optimal plan "directly in Julia" (Sec. 3.1); this
module plays that role: it turns an SDQLite physical plan into a Python
function of nested loops over plain lists/dicts, compiled once with
``exec``. Specializations:

* ``sum`` over a range / sub-array becomes ``for k in range(...)`` with
  direct list indexing (the fused CSR/CSF iteration);
* singleton-dict bodies accumulate in place (``acc.setdefault`` chains +
  scalar ``get/+``), so no intermediate dictionaries are materialized;
* nested ``sum`` bodies accumulate into the *same* accumulator
  (associativity), so a factorized plan runs as the tight loop nest the
  paper's Fig. 1(d) shows;
* ``merge`` becomes a hash join on the two arrays' values.

Depth information (scalar vs dict accumulators) comes from the same
inference the optimizer uses (repro.sdqlite.types).
"""
from __future__ import annotations

import re
from dataclasses import dataclass

import numpy as np

from repro.exec import runtime as RT
from repro.sdqlite import ast as A
from repro.sdqlite.types import infer_var_depths


@dataclass
class CompiledKernel:
    """A compiled plan: call ``fn(env)`` with the physical environment."""

    source: str
    fn: object

    def __call__(self, env: dict):
        return self.fn(env)


def _sanitize_factory():
    seen: dict[str, str] = {}
    used: set[str] = set()

    def sanitize(name: str) -> str:
        if name in seen:
            return seen[name]
        base = re.sub(r"[^0-9a-zA-Z_]", "_", name) or "_v"
        out, i = base, 0
        while out in used:
            i += 1
            out = f"{base}__{i}"
        used.add(out)
        seen[name] = out
        return out

    return sanitize


class _Gen:
    def __init__(self, depths: dict, arrays: set[str], globals_: set[str]):
        self.lines: list[str] = []  # main body (swapped during hoisting)
        self.prelude: list[str] = []  # hoisted closed aggregations
        self.n = 0
        self.depths = dict(depths)
        self.arrays = arrays
        self.globals = set(globals_)
        self.hoisted: dict[A.Expr, str] = {}
        self.sn = _sanitize_factory()

    # -- infrastructure ---------------------------------------------------
    def line(self, ind: int, s: str) -> None:
        self.lines.append("    " * ind + s)

    def tmp(self) -> str:
        self.n += 1
        return f"_t{self.n}"

    def depth(self, e: A.Expr) -> int | None:
        """Dict depth of ``e`` under the current depth environment."""
        if isinstance(e, A.Const):
            return 0
        if isinstance(e, A.Var):
            return self.depths.get(e.name)
        if isinstance(e, (A.Eq, A.Lt, A.Leq, A.Prim)):
            return 0
        if isinstance(e, (A.Add, A.Sub, A.Mul)):
            a, b = self.depth(e.a), self.depth(e.b)
            return max(a, b) if a is not None and b is not None else None
        if isinstance(e, A.Neg):
            return self.depth(e.a)
        if isinstance(e, A.Dict):
            d = self.depth(e.val)
            return d + 1 if d is not None else None
        if isinstance(e, A.Get):
            d = self.depth(e.dict)
            return d - 1 if d is not None else None
        if isinstance(e, A.Range):
            return 1
        if isinstance(e, A.SubArr):
            return self.depth(e.dict)
        if isinstance(e, A.If):
            return self.depth(e.body)
        if isinstance(e, (A.Let, A.Sum)):
            return self.depth(e.body)
        if isinstance(e, A.Merge):
            return self.depth(e.body)
        return None

    # -- expression emission ----------------------------------------------
    def value(self, e: A.Expr, ind: int) -> str:
        """Emit statements as needed; return a Python expression string."""
        if isinstance(e, A.Const):
            return repr(e.value)
        if isinstance(e, A.Var):
            return self.sn(e.name)
        if isinstance(e, A.Add):
            a, b = self.value(e.a, ind), self.value(e.b, ind)
            if self.depth(e) == 0:
                return f"({a} + {b})"
            return f"add_val({a}, {b})"
        if isinstance(e, A.Mul):
            a, b = self.value(e.a, ind), self.value(e.b, ind)
            if self.depth(e.a) == 0 and self.depth(e.b) == 0:
                return f"({a} * {b})"
            return f"mul_val({a}, {b})"
        if isinstance(e, A.Sub):
            return f"({self.value(e.a, ind)} - {self.value(e.b, ind)})"
        if isinstance(e, A.Neg):
            return f"(-{self.value(e.a, ind)})"
        if isinstance(e, A.Eq):
            return f"({self.value(e.a, ind)} == {self.value(e.b, ind)})"
        if isinstance(e, A.Lt):
            return f"({self.value(e.a, ind)} < {self.value(e.b, ind)})"
        if isinstance(e, A.Leq):
            return f"({self.value(e.a, ind)} <= {self.value(e.b, ind)})"
        if isinstance(e, A.Dict):
            return f"{{{self.value(e.key, ind)}: {self.value(e.val, ind)}}}"
        if isinstance(e, A.Get):
            d, k = self.value(e.dict, ind), self.value(e.key, ind)
            if isinstance(e.dict, A.Var) and e.dict.name in self.arrays:
                return f"{d}[{k}]"  # physical array: in-bounds by mapping
            return f"lk({d}, {k})"
        if isinstance(e, A.Range):
            lo, hi = self.value(e.lo, ind), self.value(e.hi, ind)
            return f"{{_i: _i for _i in range({lo}, {hi})}}"
        if isinstance(e, A.SubArr):
            d = self.value(e.dict, ind)
            return f"subrange({d}, {self.value(e.lo, ind)}, {self.value(e.hi, ind)})"
        if isinstance(e, A.If):
            c = self.value(e.cond, ind)
            b = self.value(e.body, ind)
            return f"({b} if {c} else 0)"
        if isinstance(e, A.Prim):
            args = ", ".join(self.value(a, ind) for a in e.args)
            return f"_prim_{e.fn}({args})"
        if isinstance(e, A.Let):
            self.depths[e.name] = self.depth(e.bound)
            self.line(ind, f"{self.sn(e.name)} = {self.value(e.bound, ind)}")
            return self.value(e.body, ind)
        if isinstance(e, (A.Sum, A.Merge)):
            return self.emit_agg(e, ind)
        raise TypeError(f"not an Expr: {e!r}")

    # -- aggregation (sum / merge) ----------------------------------------
    def emit_agg(self, e: A.Expr, ind: int) -> str:
        # A closed aggregation (free vars are all globals) is materialized
        # once, in the prelude — e.g. a storage mapping referenced inside a
        # loop in the naive plan ("first materialize the matrix, then run",
        # the paper's unfused baseline in Sec. 6.3) — instead of being
        # rebuilt on every iteration of the enclosing loops.
        if (
            ind > 1
            and self.lines is not self.prelude  # no nested hoisting
            and A.free_vars(e) <= self.globals
        ):
            if e in self.hoisted:
                return self.hoisted[e]
            saved = self.lines
            self.lines = self.prelude
            name = self._emit_agg_here(e, 1)
            self.lines = saved
            self.hoisted[e] = name
            return name
        return self._emit_agg_here(e, ind)

    def _emit_agg_here(self, e: A.Expr, ind: int) -> str:
        body = e.body
        d = self.depth(body)
        acc = self.tmp()
        if d == 0:
            self.line(ind, f"{acc} = 0.0")
        elif d is not None:
            self.line(ind, f"{acc} = {{}}")
        else:
            self.line(ind, f"{acc} = 0")  # generic semiring zero
        self.emit_loop(e, acc, d, ind)
        return acc

    def emit_loop(self, e: A.Expr, acc: str, d, ind: int) -> None:
        if isinstance(e, A.Merge):
            s1 = self.value(e.src1, ind)
            s2 = self.value(e.src2, ind)
            idx = self.tmp()
            k2i, u = self.tmp(), self.tmp()
            self.line(ind, f"{idx} = {{}}")
            self.line(ind, f"for {k2i}, {u} in it({s2}):")
            self.line(ind + 1, f"{idx}.setdefault({u}, []).append({k2i})")
            k1, v = self.sn(e.k1name), self.sn(e.vname)
            ks = self.tmp()
            self.line(ind, f"for {k1}, {v} in it({s1}):")
            self.line(ind + 1, f"{ks} = {idx}.get({v})")
            self.line(ind + 1, f"if {ks} is not None:")
            self.line(ind + 2, f"for {self.sn(e.k2name)} in {ks}:")
            for n in (e.k1name, e.k2name, e.vname):
                self.depths[n] = 0
            self.emit_acc(e.body, acc, d, ind + 3)
            return
        # Sum
        k, v = self.sn(e.kname), self.sn(e.vname)
        src = e.source
        self.depths[e.kname] = 0
        if isinstance(src, A.Range):
            lo, hi = self.value(src.lo, ind), self.value(src.hi, ind)
            self.depths[e.vname] = 0
            self.line(ind, f"for {k} in range({lo}, {hi}):")
            if e.vname in A.free_vars(e.body):
                self.line(ind + 1, f"{v} = {k}")
            self.emit_acc(e.body, acc, d, ind + 1)
            return
        if isinstance(src, A.SubArr):
            base = self.value(src.dict, ind)
            lo = self.value(src.lo, ind)
            hi = self.value(src.hi, ind)
            bd = self.depth(src.dict)
            self.depths[e.vname] = (bd - 1) if bd else 0
            direct = (
                isinstance(src.dict, A.Var) and src.dict.name in self.arrays
            )
            self.line(ind, f"for {k} in range({lo}, {hi}):")
            if e.vname in A.free_vars(e.body):
                if direct:
                    self.line(ind + 1, f"{v} = {base}[{k}]")
                else:
                    self.line(ind + 1, f"{v} = lk({base}, {k})")
            self.emit_acc(e.body, acc, d, ind + 1)
            return
        sd = self.depth(src)
        self.depths[e.vname] = (sd - 1) if sd else None
        s = self.value(src, ind)
        self.line(ind, f"for {k}, {v} in it({s}):")
        self.emit_acc(e.body, acc, d, ind + 1)

    def emit_acc(self, body: A.Expr, acc: str, d, ind: int) -> None:
        """Accumulate the value of ``body`` into ``acc`` (depth ``d``)."""
        if isinstance(body, A.If):
            self.line(ind, f"if {self.value(body.cond, ind)}:")
            self.emit_acc(body.body, acc, d, ind + 1)
            return
        if isinstance(body, A.Let):
            self.depths[body.name] = self.depth(body.bound)
            self.line(
                ind, f"{self.sn(body.name)} = {self.value(body.bound, ind)}"
            )
            self.emit_acc(body.body, acc, d, ind)
            return
        if isinstance(body, A.Add):
            self.emit_acc(body.a, acc, d, ind)
            self.emit_acc(body.b, acc, d, ind)
            return
        if isinstance(body, (A.Sum, A.Merge)):
            # nested aggregation accumulates into the same accumulator
            self.emit_loop(body, acc, d, ind)
            return
        if isinstance(body, A.Dict) and d is not None and d > 0:
            cur = acc
            node = body
            while isinstance(node.val, A.Dict):
                k = self.value(node.key, ind)
                nxt = self.tmp()
                self.line(ind, f"{nxt} = {cur}.setdefault({k}, {{}})")
                cur, node = nxt, node.val
            k = self.value(node.key, ind)
            vd = self.depth(node.val)
            if vd == 0:
                vexpr = self.value(node.val, ind)
                self.line(
                    ind, f"{cur}[{k}] = {cur}.get({k}, 0.0) + {vexpr}"
                )
            elif isinstance(node.val, (A.Sum, A.Merge)) and vd is not None:
                # dict-valued nested aggregation: accumulate straight into
                # the target slot — no temporary dictionary, no deep copy
                slot = self.tmp()
                self.line(ind, f"{slot} = {cur}.setdefault({k}, {{}})")
                self.emit_loop(node.val, slot, vd, ind)
            else:
                vexpr = self.value(node.val, ind)
                self.line(ind, f"add_at({cur}, {k}, {vexpr})")
            return
        # generic value accumulation
        vexpr = self.value(body, ind)
        if d == 0:
            self.line(ind, f"{acc} += {vexpr}")
        elif d is not None:
            self.line(ind, f"merge_into({acc}, {vexpr})")
        else:
            self.line(ind, f"{acc} = add_val({acc}, {vexpr})")


def compile_plan(
    plan: A.Expr,
    global_depths: dict[str, int] | None = None,
    array_globals: set[str] | frozenset[str] = frozenset(),
) -> CompiledKernel:
    """Compile a physical plan to a Python function ``fn(env) -> value``."""
    depths = infer_var_depths(plan, global_depths or {})
    free = sorted(A.free_vars(plan))
    g = _Gen(depths, set(array_globals), set(free))
    header = ["def _kernel(G):"] + [
        f"    {g.sn(name)} = G[{name!r}]" for name in free
    ]
    result = g.value(plan, 1)
    g.line(1, f"return {result}")
    source = "\n".join(header + g.prelude + g.lines)
    ns = {
        "it": RT.it,
        "lk": RT.lk,
        "add_val": RT.add_val,
        "mul_val": RT.mul_val,
        "merge_into": RT.merge_into,
        "add_at": RT.add_at,
        "subrange": RT.subrange,
        **{f"_prim_{k}": v for k, v in RT.PRIMITIVES.items()},
    }
    exec(compile(source, "<sdqlite-plan>", "exec"), ns)
    return CompiledKernel(source=source, fn=ns["_kernel"])


def array_names(env: dict) -> set[str]:
    """The env names safe for direct ``a[k]`` indexing (arrays/lists only —
    dicts must go through lk() for missing-is-zero semantics)."""
    return {
        k for k, v in env.items() if isinstance(v, (np.ndarray, list))
    }


def prepare_env(env: dict) -> dict:
    """Convert NumPy arrays to Python lists (fast indexing in loops)."""
    out = {}
    for k, v in env.items():
        if isinstance(v, np.ndarray):
            out[k] = v.tolist()
        elif isinstance(v, (np.integer,)):
            out[k] = int(v)
        elif isinstance(v, (np.floating,)):
            out[k] = float(v)
        else:
            out[k] = v
    return out


def run_plan(
    plan: A.Expr,
    env: dict,
    global_depths: dict[str, int] | None = None,
):
    """One-shot compile + run (tests); benchmarks compile once instead."""
    ck = compile_plan(plan, global_depths, array_names(env))
    return ck(prepare_env(env))
