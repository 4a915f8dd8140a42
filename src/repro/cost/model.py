"""The cost model of paper Fig. 6, evaluated during e-graph extraction.

Every extraction choice carries an :class:`Est` — the estimated
cardinality (Fig. 5), the collection kind ("dense" | "hash" | None), and
the name of the underlying physical collection when traceable. The cost
rules mirror Fig. 6:

    cost(e1(e2))         = cost(e1) + cost(e2) + gamma_lookup(e1)
    cost({e1 -> e2})     = infinity                       (logical dict)
    cost({@dense ...})   = cost(k) + cost(v) + gamma_arr_insert
    cost({@hash ...})    = cost(k) + cost(v) + gamma_hash_insert
    cost(let x=e1 in e2) = gamma_mater * cost(e1) + cost(e2)
    cost(if e1 then e2)  = cost(e1) + sel(e1) * cost(e2)
    cost(sum ... e1 e2)  = cost(e1) + gamma_iter(e1)*size(e1)*cost(e2)
    cost(merge)          = cost(e1)+cost(e2)
                           + (g_it1*size1 + g_it2*size2) * cost(e3)

gamma parameters depend on the collection kind: iterating/looking up a
dense array is cheaper than a hash map (Sec. 5.7).
"""
from __future__ import annotations

import math
from dataclasses import dataclass, field

from repro.cost import cardinality as C

INF = math.inf


@dataclass(frozen=True)
class Gammas:
    """Per-kind cost constants (dense array vs hash map)."""

    iter_dense: float = 1.0
    iter_hash: float = 2.5
    lookup_dense: float = 1.5
    lookup_hash: float = 4.0
    insert_dense: float = 1.2
    insert_hash: float = 6.0
    mater: float = 1.5
    # per-entry cost of +/* applied to whole dictionaries: these allocate
    # and merge fresh dictionaries in the runtime, which is several times
    # the cost of a fused per-entry loop iteration
    dictop: float = 6.0

    def iter_(self, kind: str | None) -> float:
        return self.iter_hash if kind == "hash" else self.iter_dense

    def lookup(self, kind: str | None) -> float:
        return self.lookup_hash if kind == "hash" else self.lookup_dense

    def insert(self, kind: str | None) -> float:
        return self.insert_hash if kind == "hash" else self.insert_dense


@dataclass
class Est:
    """Extraction payload: cardinality + collection kind + origin.
    ``value`` carries known constant values (for range sizes)."""

    card: C.Card = C.S
    kind: str | None = None
    src: str | None = None
    value: object = None


@dataclass
class Stats:
    """Data statistics, provided by the harness (the paper's "DBA")."""

    var_est: dict[str, Est] = field(default_factory=dict)
    selectivity: float = 0.1  # paper's default predicate selectivity
    default_card: float = 100.0
    gammas: Gammas = field(default_factory=Gammas)


# Cost discount for *closed* aggregate subexpressions (free variables are
# all globals — no binder-introduced name, which our fresh-name scheme
# marks with '%'). The code generator materializes such subexpressions
# once (hoisting, exec.codegen), so charging their construction at every
# use would wrongly favour re-iteration over lookup.
AMORT = 0.05


def _amortized(choice) -> bool:
    node_op = choice.node[0][0] if getattr(choice, "node", None) else None
    return node_op in ("sum", "merge") and not any(
        "%" in n for n in choice.fv
    )


def make_costfn(stats: Stats):
    """Build a cost function for :func:`repro.egraph.extract.extract`."""
    g = stats.gammas

    def costfn(op: tuple, kids, node):
        kind = op[0]
        ccost = [
            k.cost * AMORT if _amortized(k) else k.cost for k in kids
        ]
        cdata = [k.data if isinstance(k.data, Est) else Est() for k in kids]

        if kind == "const":
            return 0.0, Est(C.S, value=op[1])
        if kind == "var":
            est = stats.var_est.get(op[1])
            return 0.0, est if est is not None else Est(C.S)
        if kind in ("eq", "lt", "leq", "neg", "prim"):
            return sum(ccost) + 0.1, Est(C.S)
        if kind in ("add", "sub"):
            card = C.card_add(cdata[0].card, cdata[1].card)
            work = 0.0 if card == C.S else g.dictop * C.total(card)
            return sum(ccost) + 0.1 + work, Est(card, cdata[0].kind)
        if kind == "mul":
            card = C.card_mul(cdata[0].card, cdata[1].card)
            work = 0.0 if card == C.S else g.dictop * C.total(card)
            dk = cdata[0].kind if cdata[0].card != C.S else cdata[1].kind
            return sum(ccost) + 0.1 + work, Est(card, dk)
        if kind == "dict":
            phys = op[2]
            if phys is None:
                return INF, Est(C.card_dict(cdata[1].card))
            ins = g.insert(phys)
            return (
                sum(ccost) + ins,
                Est(C.card_dict(cdata[1].card), phys),
            )
        if kind == "get":
            base = cdata[0]
            return (
                sum(ccost) + g.lookup(base.kind),
                Est(C.inner(base.card), base.kind, base.src),
            )
        if kind == "range":
            lo, hi = cdata[0].value, cdata[1].value
            if isinstance(lo, (int, float)) and isinstance(hi, (int, float)):
                n = max(0.0, hi - lo)
            else:
                n = stats.default_card
            return sum(ccost), Est(C.seq(n), "dense")
        if kind == "subarr":
            base = cdata[0]
            seg = stats.var_est.get(f"{base.src}#segment") if base.src else None
            n = C.outer(seg.card) if seg else max(
                1.0, C.outer(base.card) ** 0.5
            )
            return sum(ccost), Est(C.seq(n, C.inner(base.card)), "dense", base.src)
        if kind == "if":
            return (
                ccost[0] + stats.selectivity * ccost[1],
                Est(C.scale(cdata[1].card, stats.selectivity), cdata[1].kind),
            )
        if kind == "let":
            return (
                g.mater * ccost[0] + ccost[1],
                cdata[1],
            )
        if kind == "sum":
            src, body = cdata
            n = C.outer(src.card)
            cost = ccost[0] + g.iter_(src.kind) * n * (ccost[1] + 0.1)
            return cost, Est(C.scale(body.card, n), body.kind)
        if kind == "merge":
            s1, s2, body = cdata
            n1, n2 = C.outer(s1.card), C.outer(s2.card)
            cost = (
                ccost[0]
                + ccost[1]
                + (g.iter_(s1.kind) * n1 + g.iter_(s2.kind) * n2)
                * 0.5  # merge advances two cursors, each entry visited once
                * (ccost[2] + 0.1)
            )
            est_n = min(n1, n2)
            return cost, Est(C.scale(body.card, est_n), body.kind)
        raise ValueError(f"unknown op {op!r}")

    return costfn


def seed_var_estimates(expr, stats: Stats) -> None:
    """Walk the (naive-plan) AST and derive estimates for binder-introduced
    variables from the estimates of the collections they iterate: in
    ``sum(<k,v> in e)``, k is a scalar and v has e's inner cardinality.
    Mirrors repro.sdqlite.types.infer_var_depths; mutates stats.var_est."""
    from repro.sdqlite import ast as A

    def est_of(x) -> Est:
        if isinstance(x, A.Const):
            return Est(C.S)
        if isinstance(x, A.Var):
            return stats.var_est.get(x.name, Est(C.S))
        if isinstance(x, (A.Eq, A.Lt, A.Leq, A.Neg, A.Prim)):
            for c in A.children(x):
                est_of(c)
            return Est(C.S)
        if isinstance(x, (A.Add, A.Sub)):
            a, b = est_of(x.a), est_of(x.b)
            return Est(C.card_add(a.card, b.card), a.kind or b.kind)
        if isinstance(x, A.Mul):
            a, b = est_of(x.a), est_of(x.b)
            k = a.kind if a.card != C.S else b.kind
            return Est(C.card_mul(a.card, b.card), k)
        if isinstance(x, A.Dict):
            est_of(x.key)
            v = est_of(x.val)
            return Est(C.card_dict(v.card), x.phys)
        if isinstance(x, A.Get):
            d = est_of(x.dict)
            est_of(x.key)
            return Est(C.inner(d.card), d.kind, d.src)
        if isinstance(x, A.Range):
            def endpoint(ep):
                if isinstance(ep, A.Const):
                    return ep.value
                if isinstance(ep, A.Var):
                    e = stats.var_est.get(ep.name)
                    return e.value if e else None
                return None

            lo, hi = endpoint(x.lo), endpoint(x.hi)
            if isinstance(lo, (int, float)) and isinstance(hi, (int, float)):
                return Est(C.seq(max(0.0, hi - lo)), "dense")
            return Est(C.seq(stats.default_card), "dense")
        if isinstance(x, A.SubArr):
            d = est_of(x.dict)
            seg = stats.var_est.get(f"{d.src}#segment") if d.src else None
            n = C.outer(seg.card) if seg else max(1.0, C.outer(d.card) ** 0.5)
            return Est(C.seq(n, C.inner(d.card)), "dense", d.src)
        if isinstance(x, A.If):
            est_of(x.cond)
            b = est_of(x.body)
            return Est(C.scale(b.card, stats.selectivity), b.kind)
        if isinstance(x, A.Let):
            stats.var_est[x.name] = est_of(x.bound)
            return est_of(x.body)
        if isinstance(x, A.Sum):
            s = est_of(x.source)
            stats.var_est[x.kname] = Est(C.S)
            stats.var_est[x.vname] = Est(C.inner(s.card), s.kind, s.src)
            b = est_of(x.body)
            return Est(C.scale(b.card, C.outer(s.card)), b.kind)
        if isinstance(x, A.Merge):
            s1, s2 = est_of(x.src1), est_of(x.src2)
            for n in (x.k1name, x.k2name, x.vname):
                stats.var_est[n] = Est(C.S)
            b = est_of(x.body)
            n = min(C.outer(s1.card), C.outer(s2.card))
            return Est(C.scale(b.card, n), b.kind)
        raise TypeError(f"not an Expr: {x!r}")

    est_of(expr)
