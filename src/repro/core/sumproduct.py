"""Sum-product IR: bridges optimized SDQLite logical plans to relational
engines (PySpark DataFrames, DuckDB SQL).

A stage-1 optimized tensor program is a nest of ``sum`` loops over logical
tensors with equality guards, singleton-dict outputs, and products whose
factors may be constants, scalar parameters, tensor lookups, *dictionary-
valued row variables* (residual iteration) and *correlated sub-aggregates*
(the factorized forms produced by rules D2-D4). :func:`to_sumproduct`
recognizes that shape into :class:`SP`:

  atoms      tensor accesses (tensor, index vars, value var)
  subs       correlated sub-aggregates, grouped by the outer vars they use
  factors    the multiplicative terms of the body
  out_keys   output index vars, in nesting order

Relationally: join the atoms on shared index vars (a natural join — the
equality guards were unified into shared names), multiply the factors,
group by ``out_keys`` and sum. A factorized plan becomes aggregation
pushed below a join, which is exactly the plan shape Spark executes well.
"""
from __future__ import annotations

from dataclasses import dataclass, field

from repro.sdqlite import ast as A
from repro.sdqlite.types import infer_var_depths


class Unsupported(Exception):
    """The plan is outside the recognizable sum-product fragment."""


@dataclass
class Atom:
    tensor: str
    keys: list[str]
    val: str | None  # None while partially bound / if value never used


@dataclass
class SubAgg:
    sp: "SP"
    keys: list[str]  # outer vars this correlated aggregate is grouped by
    val: str  # name its aggregated value is referenced by


@dataclass
class SP:
    atoms: list[Atom] = field(default_factory=list)
    subs: list[SubAgg] = field(default_factory=list)
    factors: list[tuple] = field(default_factory=list)
    out_keys: list[str] = field(default_factory=list)

    def all_key_vars(self) -> set[str]:
        out = set()
        for a in self.atoms:
            out |= set(a.keys)
        for s in self.subs:
            out |= set(s.keys)
        return out


class _UF:
    def __init__(self):
        self.p: dict[str, str] = {}

    def find(self, x: str) -> str:
        self.p.setdefault(x, x)
        while self.p[x] != x:
            self.p[x] = self.p[self.p[x]]
            x = self.p[x]
        return x

    def union(self, a: str, b: str, prefer: str | None = None) -> None:
        ra, rb = self.find(a), self.find(b)
        if ra == rb:
            return
        if prefer is not None and self.find(prefer) == rb:
            ra, rb = rb, ra
        self.p[rb] = ra


class _Recognizer:
    def __init__(self, tensors: dict[str, int], scalars: set[str], depths):
        self.tensors = tensors  # name -> rank
        self.scalars = scalars
        self.depths = depths
        self.uf = _UF()
        self.n = 0

    def fresh(self, hint="v") -> str:
        self.n += 1
        return f"_{hint}{self.n}"

    # rowvars: var name -> (Atom, level), meaning the var holds the value
    # of ``Atom`` after binding ``level`` of its keys (extended in place
    # within the same scope), or ("ref", tensor, prefix) for a row variable
    # inherited from an enclosing scope (iterating it re-accesses the
    # tensor as a fresh atom keyed by the outer prefix).
    def parse(
        self, e: A.Expr, bound: set[str], outer_bound: set[str],
        rowvars0: dict | None = None,
    ) -> SP:
        sp = SP()
        rowvars: dict = dict(rowvars0 or {})
        self._walk(e, sp, rowvars, set(bound), outer_bound)
        return sp

    def canonicalize(self, sp: SP) -> None:
        """Rewrite all names to union-find representatives, recursively.
        Run once at the very end, when all equalities are known."""
        f = self.uf.find
        sp.atoms = [
            Atom(a.tensor, [f(k) for k in a.keys], f(a.val) if a.val else None)
            for a in sp.atoms
        ]
        for s in sp.subs:
            s.keys = [f(k) for k in s.keys]
            self.canonicalize(s.sp)
        sp.factors = [
            ("val", f(x[1])) if x[0] == "val" else x for x in sp.factors
        ]
        sp.out_keys = [f(k) for k in sp.out_keys]

    def _depth_of(self, e: A.Expr) -> int | None:
        """Dictionary depth of an expression (0 = scalar), from the global
        depth inference over the whole plan."""
        if isinstance(e, A.Const):
            return 0
        if isinstance(e, A.Var):
            return self.depths.get(e.name)
        if isinstance(e, (A.Eq, A.Lt, A.Leq, A.Prim)):
            return 0
        if isinstance(e, (A.Add, A.Sub, A.Mul)):
            a, b = self._depth_of(e.a), self._depth_of(e.b)
            return max(a, b) if a is not None and b is not None else None
        if isinstance(e, A.Neg):
            return self._depth_of(e.a)
        if isinstance(e, A.Dict):
            d = self._depth_of(e.val)
            return d + 1 if d is not None else None
        if isinstance(e, A.Get):
            d = self._depth_of(e.dict)
            return d - 1 if d is not None else None
        if isinstance(e, A.Range):
            return 1
        if isinstance(e, A.SubArr):
            return self._depth_of(e.dict)
        if isinstance(e, A.If):
            return self._depth_of(e.body)
        if isinstance(e, (A.Let, A.Sum)):
            return self._depth_of(e.body)
        if isinstance(e, A.Merge):
            return self._depth_of(e.body)
        return None

    def _resolve_source(self, src: A.Expr, rowvars):
        """Resolve an iteration source / lookup base to (tensor, key prefix)
        or an existing (Atom, level)."""
        if isinstance(src, A.Var):
            if src.name in self.tensors:
                return (src.name, [])
            if src.name in rowvars:
                rv = rowvars[src.name]
                if rv[0] == "ref":  # foreign row var: fresh tensor access
                    return (rv[1], list(rv[2]))
                return rv
            raise Unsupported(f"cannot iterate {src.name}")
        if isinstance(src, A.Get):
            base = self._resolve_source(src.dict, rowvars)
            if not isinstance(src.key, A.Var):
                raise Unsupported("non-variable lookup key")
            k = src.key.name
            if isinstance(base, tuple) and isinstance(base[0], str):
                return (base[0], base[1] + [k])
            atom, level = base
            # a lookup into a partially-iterated atom re-accesses the tensor
            return (atom.tensor, atom.keys[:level] + [k])
        raise Unsupported(f"unsupported source {type(src).__name__}")

    def _walk(self, e, sp: SP, rowvars, bound: set[str], outer: set[str]):
        if isinstance(e, A.Mul):
            # a product with exactly one dictionary-valued operand (e.g.
            # "(sum ... {i -> ...}) * a * beta"): the scalar operands are
            # multiplicative factors, the dict-valued one is walked — its
            # internal loops/guards/dict keys belong to this same SP.
            ops: list = []
            stack = [e]
            while stack:
                x = stack.pop()
                if isinstance(x, A.Mul):
                    stack.extend((x.a, x.b))
                else:
                    ops.append(x)
            dictish = [x for x in ops if self._depth_of(x) not in (0,)]
            if len(dictish) == 1:
                for x in ops:
                    if x is not dictish[0]:
                        self._product(x, sp, rowvars, bound, outer)
                self._walk(dictish[0], sp, rowvars, bound, outer)
                return
            self._product(e, sp, rowvars, bound, outer)
            return
        if isinstance(e, A.Sum):
            res = self._resolve_source(e.source, rowvars)
            if isinstance(res[0], str):
                tensor, prefix = res
                atom = Atom(tensor, list(prefix), None)
                sp.atoms.append(atom)
                level = len(prefix)
            else:
                atom, level = res
            atom.keys.append(e.kname)
            bound = bound | {e.kname, e.vname}
            if len(atom.keys) == self.tensors[atom.tensor]:
                atom.val = e.vname
            else:
                rowvars[e.vname] = (atom, len(atom.keys))
            self._walk(e.body, sp, rowvars, bound, outer)
            return
        if isinstance(e, A.If):
            c = e.cond
            if isinstance(c, A.Eq) and isinstance(c.a, A.Var) \
                    and isinstance(c.b, A.Var):
                # prefer the outer-bound name as representative so that
                # correlated sub-aggregates group by outer names
                pref = c.b.name if c.b.name in outer else c.a.name
                self.uf.union(c.a.name, c.b.name, prefer=pref)
                self._walk(e.body, sp, rowvars, bound, outer)
                return
            raise Unsupported("non-equality guard")
        if isinstance(e, A.Dict):
            if not isinstance(e.key, A.Var):
                raise Unsupported("non-variable output key")
            sp.out_keys.append(e.key.name)
            self._walk(e.val, sp, rowvars, bound, outer)
            return
        if isinstance(e, A.Let):
            raise Unsupported("let in logical plan")
        # multiplicative body
        self._product(e, sp, rowvars, bound, outer)

    def _product(self, e, sp: SP, rowvars, bound, outer):
        if isinstance(e, A.Mul):
            self._product(e.a, sp, rowvars, bound, outer)
            self._product(e.b, sp, rowvars, bound, outer)
            return
        if isinstance(e, A.Const):
            sp.factors.append(("const", e.value))
            return
        if isinstance(e, A.Var):
            name = e.name
            if name in self.scalars:
                sp.factors.append(("scalar", name))
                return
            if name in rowvars:
                # dictionary-valued factor: residual iteration of the atom
                rv = rowvars[name]
                if rv[0] == "ref":
                    atom = Atom(rv[1], list(rv[2]), None)
                    sp.atoms.append(atom)
                else:
                    atom, _level = rv
                rank = self.tensors[atom.tensor]
                level = len(atom.keys)
                for _ in range(level, rank):
                    k = self.fresh("k")
                    atom.keys.append(k)
                    sp.out_keys.append(k)
                v = self.fresh("v")
                atom.val = v
                sp.factors.append(("val", v))
                return
            # a bound scalar value variable
            sp.factors.append(("val", name))
            return
        if isinstance(e, A.Get):
            res = self._resolve_source(e, rowvars)
            tensor, keys = res
            atom = Atom(tensor, list(keys), None)
            sp.atoms.append(atom)
            rank = self.tensors[tensor]
            # a partial lookup (e.g. the row B(j)) is dictionary-valued:
            # its residual dimensions become output keys
            for _ in range(len(keys), rank):
                kk = self.fresh("k")
                atom.keys.append(kk)
                sp.out_keys.append(kk)
            v = self.fresh("v")
            atom.val = v
            sp.factors.append(("val", v))
            return
        if isinstance(e, A.Sum):
            # dict-valued partial lookup:
            #   sum(<k,v> in SRC) if (k == o) then v   ==  SRC(o)
            # (an access to the sub-tensor at prefix+[o]); treated like a
            # row-variable factor — residual dims become output keys.
            pl = self._match_partial_lookup(e, rowvars)
            if pl is not None:
                tensor, keys = pl
                atom = Atom(tensor, list(keys), None)
                sp.atoms.append(atom)
                rank = self.tensors[tensor]
                for _ in range(len(keys), rank):
                    kk = self.fresh("k")
                    atom.keys.append(kk)
                    sp.out_keys.append(kk)
                v = self.fresh("v")
                atom.val = v
                sp.factors.append(("val", v))
                return
            # correlated sub-aggregate: parse in a nested scope; group by
            # the outer variables its atoms reference. Row variables of the
            # current scope are passed down as foreign references.
            foreign = {
                n: rv if rv[0] == "ref"
                else ("ref", rv[0].tensor, list(rv[0].keys[: rv[1]]))
                for n, rv in rowvars.items()
            }
            sub = self.parse(e, set(), bound, foreign)
            if sub.out_keys:
                raise Unsupported("dict-valued sub-aggregate factor")
            bound_canon = {self.uf.find(b) for b in bound}
            # factors referencing outer-bound values are loop-invariant
            # inside the sub-aggregate: hoist them to the parent product
            # (sum(X * a) = a * sum(X)).
            keep, lift = [], []
            for f in sub.factors:
                if f[0] == "val" and self.uf.find(f[1]) in bound_canon:
                    lift.append(f)
                else:
                    keep.append(f)
            sub.factors = keep
            sp.factors.extend(lift)
            outer_used = sorted(
                {self.uf.find(k) for k in sub.all_key_vars()}
                & bound_canon
            )
            sub.out_keys = outer_used
            v = self.fresh("s")
            sp.subs.append(SubAgg(sub, outer_used, v))
            sp.factors.append(("val", v))
            return
        raise Unsupported(f"unsupported factor {type(e).__name__}")

    def _match_partial_lookup(self, e: A.Sum, rowvars):
        """Match sum(<k,v> in SRC) if (k == o) then v, SRC resolvable to a
        tensor prefix; returns (tensor, prefix + [o]) or None."""
        body = e.body
        if not (isinstance(body, A.If) and isinstance(body.cond, A.Eq)):
            return None
        c = body.cond
        if not (isinstance(c.a, A.Var) and isinstance(c.b, A.Var)):
            return None
        if c.a.name == e.kname:
            other = c.b.name
        elif c.b.name == e.kname:
            other = c.a.name
        else:
            return None
        if not (isinstance(body.body, A.Var)
                and body.body.name == e.vname):
            return None
        try:
            res = self._resolve_source(e.source, rowvars)
        except Unsupported:
            return None
        if isinstance(res[0], str):
            tensor, prefix = res
        else:
            atom, level = res
            tensor, prefix = atom.tensor, atom.keys[:level]
        return tensor, list(prefix) + [other]


def to_sumproduct(
    plan: A.Expr,
    tensors: dict[str, int],
    scalars: set[str] | None = None,
) -> SP:
    """Recognize an optimized logical plan into the sum-product IR.
    ``tensors`` maps logical tensor names to ranks; ``scalars`` names
    scalar parameters. Raises :class:`Unsupported` outside the fragment."""
    depths = infer_var_depths(
        plan, {**{t: r for t, r in tensors.items()},
               **{s: 0 for s in (scalars or ())}},
    )
    rec = _Recognizer(dict(tensors), set(scalars or ()), depths)
    sp = rec.parse(plan, set(), set())
    rec.canonicalize(sp)
    return sp
