"""AST-level loop fusion: the substitution-based rewrites that cannot live
inside the e-graph (paper Sec. 5.4: Egg cannot express ``e2[e1/x]``).

Applied between saturation rounds (and to the composed plan before stage-2
saturation) by the compile pipeline. Everything here is plain AST surgery
on a tree whose binder names are globally unique and whose subtrees move —
never copy — so no capture or duplicate-binder issue can arise, unlike
substitution *inside* the e-graph.

Rewrites (driving Fig. 1(d)-style fused loops):

  F-chain   sum(<k1,v1> in (sum(<k2,v2> in e1) e2)) e4
              -> sum(<k2,v2> in e1) sum(<k1,v1> in e2) e4
            when e2 is an @unique dictionary (rule F3's condition) or e4
            is LINEAR in v1 (rule F5's condition — grouping commutes with
            a linear consumer)
  F-single  sum(<k,v> in {e2 -> e3}) e4  ->  e4[k:=e2, v:=e3]
  F-if      sum(<k,v> in (if c then s)) e4
              -> if c then sum(<k,v> in s) e4
  F-let     sum(<k,v> in (let x=b in s)) e4
              -> let x=b in sum(<k,v> in s) e4
"""
from __future__ import annotations

from repro.sdqlite import ast as A


def ast_degree(e: A.Expr, var: str) -> int | None:
    """Degree of ``e`` in ``var``: 0 constant, 1 strictly linear
    (homogeneous), None unknown — the AST twin of rules.linearity."""
    if var not in A.free_vars(e):
        return 0
    if isinstance(e, A.Var):
        return 1 if e.name == var else 0
    if isinstance(e, (A.Add, A.Sub)):
        a, b = ast_degree(e.a, var), ast_degree(e.b, var)
        return a if a is not None and a == b else None
    if isinstance(e, A.Neg):
        return ast_degree(e.a, var)
    if isinstance(e, A.Mul):
        a, b = ast_degree(e.a, var), ast_degree(e.b, var)
        if a is None or b is None:
            return None
        return a + b if a + b <= 1 else None
    if isinstance(e, (A.Eq, A.Lt, A.Leq, A.Prim, A.Range)):
        return 0 if all(
            ast_degree(c, var) == 0 for c in A.children(e)
        ) else None
    if isinstance(e, A.Dict):
        if ast_degree(e.key, var) != 0:
            return None
        return ast_degree(e.val, var)
    if isinstance(e, A.Get):
        if ast_degree(e.key, var) != 0:
            return None
        return ast_degree(e.dict, var)
    if isinstance(e, A.SubArr):
        if ast_degree(e.lo, var) != 0 or ast_degree(e.hi, var) != 0:
            return None
        return ast_degree(e.dict, var)
    if isinstance(e, A.If):
        return ast_degree(e.body, var) if ast_degree(e.cond, var) == 0 \
            else None
    if isinstance(e, A.Let):
        if ast_degree(e.bound, var) == 0:
            return ast_degree(e.body, var)
        return None
    if isinstance(e, A.Sum):
        sdeg = ast_degree(e.source, var)
        if sdeg == 0:
            return ast_degree(e.body, var)
        if sdeg == 1 and var not in A.free_vars(e.body):
            return 1 if ast_degree(e.body, e.vname) == 1 else None
        return None
    if isinstance(e, A.Merge):
        if ast_degree(e.src1, var) == 0 and ast_degree(e.src2, var) == 0:
            return ast_degree(e.body, var)
        return None
    return None


def _subst_once_then_fresh(e: A.Expr, mapping: dict) -> A.Expr:
    """Substitute variables by expressions; the first occurrence receives
    the original subtree, later occurrences an alpha-freshened copy, so
    binder names stay globally unique even when a variable is used more
    than once."""
    used: set[str] = set()

    def go(x: A.Expr) -> A.Expr:
        if isinstance(x, A.Var) and x.name in mapping:
            rep = mapping[x.name]
            if x.name in used:
                return A.alpha_fresh(rep)
            used.add(x.name)
            return rep
        return A.rebuild(x, tuple(go(c) for c in A.children(x)))

    return go(e)


def fuse_pass(e: A.Expr) -> A.Expr:
    """One bottom-up fusion pass (applies to fixpoint at each node)."""
    kids = tuple(fuse_pass(c) for c in A.children(e))
    e = A.rebuild(e, kids)
    if isinstance(e, A.Get):
        # G-fuse: a lookup into a sum-built dictionary with @unique keys
        # equal to the loop key is substitution (the CSR row access of
        # Fig. 1(d)):  (sum(<k,v> in s) {@unique k -> val})(key)
        #                -> val[k := key, v := s(key)]
        d = e.dict
        if (
            isinstance(d, A.Sum)
            and isinstance(d.body, A.Dict)
            and d.body.unique
            and d.body.key == A.Var(d.kname)
        ):
            rep = {d.kname: e.key, d.vname: A.Get(d.source, e.key)}
            return fuse_pass(_subst_once_then_fresh(d.body.val, rep))
        return e
    if not isinstance(e, A.Sum):
        return e
    src = e.source
    if isinstance(src, A.Sum):
        fusable = (
            (isinstance(src.body, A.Dict) and src.body.unique)
            or ast_degree(e.body, e.vname) == 1
        )
        if fusable:
            inner = A.Sum(e.kname, e.vname, src.body, e.body)
            return fuse_pass(
                A.Sum(src.kname, src.vname, src.source, inner)
            )
    if isinstance(src, A.Dict):
        body = _subst_once_then_fresh(
            e.body, {e.kname: src.key, e.vname: src.val}
        )
        return fuse_pass(body)
    if isinstance(src, A.If):
        return A.If(
            src.cond,
            fuse_pass(A.Sum(e.kname, e.vname, src.body, e.body)),
        )
    if isinstance(src, A.Let):
        return A.Let(
            src.name, src.bound,
            fuse_pass(A.Sum(e.kname, e.vname, src.body, e.body)),
        )
    return e
