"""The 44 SDQLite rewrite rules (paper Fig. 3) + 2 physical rules (Sec. 5.6).

Families (used by the Fig. 9 rule-ablation experiment):
  assoc     A1/A5  — associativity of * and +
  comm      C1-C3  — commutativity of +, ==, *
  hoist     A2-A4, A6 — moving scalar factors across {k -> .} and if,
                     and loop-invariant guard motion across sum
  simplify  L1-L6  — algebraic identities (unidirectional)
  factor    D1-D4  — distributivity / factorization (the headline rules)
  fusion    F1-F4  — loop fusion (iteration -> lookup, sum-of-dict fusion,
                     @unique fusion, merge). Deep fusion *through* the lets
                     these rules introduce is achieved by the compile
                     pipeline's iterated saturation (extract, inline
                     single-use lets syntactically, re-saturate) — the
                     substitution Egg cannot express (paper Sec. 5.4).
  dict      T1-T4 + get-of-dict, dead-let
  phys      logical {k -> e} -> @dense / @hash (Sec. 5.6)

Direction notes: bidirectional rules in the paper appear here as two rules
(suffix ``r``). T1's *expansion* direction (e -> sum(<k,v> in e){k -> v})
is omitted: each application would mint fresh binder names, growing the
e-graph forever — the paper avoids this with De Bruijn indices (Sec. 5.4);
with globally-unique names the generative direction is never productive.
"""
from __future__ import annotations

from repro.egraph.pattern import P, PVar, Rule, fv_guard


def _scalar(name: str):
    """Guard: the class bound to ``name`` has dictionary depth 0."""

    def g(s, eg):
        return eg.depth.get(eg.find(s[name])) == 0

    return g


def _both(name, lhs, rhs, guard=None, guard_r=None):
    return [
        Rule(name, lhs, rhs, guard),
        Rule(name + "r", rhs, lhs, guard_r if guard_r is not None else guard),
    ]


e1, e2, e3, e4 = PVar("e1"), PVar("e2"), PVar("e3"), PVar("e4")


def _assoc() -> list[Rule]:
    return _both(
        "A1",
        P("mul", e1, P("mul", e2, e3)),
        P("mul", P("mul", e1, e2), e3),
    ) + _both(
        "A5",
        P("add", e1, P("add", e2, e3)),
        P("add", P("add", e1, e2), e3),
    )


def _comm() -> list[Rule]:
    return [
        Rule("C1", P("add", e1, e2), P("add", e2, e1)),
        Rule("C2", P("eq", e1, e2), P("eq", e2, e1)),
        Rule("C3", P("mul", e1, e2), P("mul", e2, e1)),
    ]


def _hoist() -> list[Rule]:
    # A2: {e1 -> e2*e3} <-> {e1 -> e2} * e3      (e3 scalar)
    # A3: {e1 -> e2*e3} <-> e2 * {e1 -> e3}      (e2 scalar)
    # A4: if(e1) then e2*e3 <-> e2 * if(e1) then e3
    # A6: sum(<k,v> in e1) if(c) then e3 <-> if(c) then sum(<k,v> in e1) e3
    #     (k,v not free in c — loop-invariant guard motion; this is what
    #     lets fusion rule F1 see the equality guard next to the loop)
    fl = ("?u", "?p")
    kv = ("?k", "?v")
    return (
        _both(
            "A6",
            P("sum", e1, P("if", e2, e3), payload=kv),
            P("if", e2, P("sum", e1, e3, payload=kv)),
            guard=fv_guard("?k", "?v", of="e2"),
        )
        +
        _both(
            "A2",
            P("dict", e1, P("mul", e2, e3), payload=fl),
            P("mul", P("dict", e1, e2, payload=fl), e3),
            guard=_scalar("e3"),
        )
        + _both(
            "A3",
            P("dict", e1, P("mul", e2, e3), payload=fl),
            P("mul", e2, P("dict", e1, e3, payload=fl)),
            guard=_scalar("e2"),
        )
        + _both(
            "A4",
            P("if", e1, P("mul", e2, e3)),
            P("mul", e2, P("if", e1, e3)),
        )
        + [
            # LM1/LM2: move a factor that does not use the binding across a
            # let — lets D2/D3 hoist loop-invariant factors out of sums
            # whose bodies were produced by the fusion rules (F1/F3/F5/F6
            # bind via let).
            Rule(
                "LM1",
                P("let", e1, P("mul", e2, e3), payload=("?x",)),
                P("mul", P("let", e1, e2, payload=("?x",)), e3),
                guard=fv_guard("?x", of="e3"),
            ),
            Rule(
                "LM2",
                P("let", e1, P("mul", e2, e3), payload=("?x",)),
                P("mul", e2, P("let", e1, e3, payload=("?x",))),
                guard=fv_guard("?x", of="e2"),
            ),
        ]
    )


def _simplify() -> list[Rule]:
    zero, one = P("const", payload=(0,)), P("const", payload=(1,))
    # The mirror-image forms (0+e, 1*e) are reachable through C1/C3
    # commutativity, so only one direction of each identity is needed.
    return [
        Rule("L1", P("add", e1, zero), e1),
        Rule("L2", P("mul", e1, zero), P("const", payload=(0,))),
        Rule("L2r", P("mul", zero, e1), P("const", payload=(0,))),
        Rule("L3", P("mul", e1, one), e1),
        Rule("L5", P("sub", e1, zero), e1),
        Rule("L6", P("sub", e1, e1), P("const", payload=(0,))),
    ]


def _factor() -> list[Rule]:
    kv = ("?k", "?v")
    return (
        _both(
            "D1",
            P("add", P("mul", e1, e2), P("mul", e1, e3)),
            P("mul", e1, P("add", e2, e3)),
        )
        + _both(
            "D2",
            P("sum", e1, P("mul", e2, e3), payload=kv),
            P("mul", e2, P("sum", e1, e3, payload=kv)),
            guard=fv_guard("?k", "?v", of="e2"),
        )
        + _both(
            "D3",
            P("sum", e1, P("mul", e2, e3), payload=kv),
            P("mul", P("sum", e1, e2, payload=kv), e3),
            guard=fv_guard("?k", "?v", of="e3"),
        )
        + _both(
            "D4",
            P("sum", e1, P("dict", e2, e3, payload=("?u", "?p")), payload=kv),
            P("dict", e2, P("sum", e1, e3, payload=kv), payload=("?u", "?p")),
            guard=fv_guard("?k", "?v", of="e2"),
        )
    )


# -- fusion rules: RHS assembled by builders (they create let-bindings that
#    re-bind the names the fused loops used to bind) -------------------------

def _f1_rhs(s, eg):
    k, v = s["?k"], s["?v"]
    vark = eg.add(("var", k))
    getk = eg.add(("get",), (s["e1"], vark))
    letv = eg.add(("let", v), (getk, s["e3"]))
    return eg.add(("let", k), (s["e2"], letv))


def _f2_rhs(s, eg):
    k1, v1, k2, v2 = s["?k1"], s["?v1"], s["?k2"], s["?v2"]
    vark2 = eg.add(("var", k2))
    letv1 = eg.add(("let", v1), (s["e2"], s["e3"]))
    letk1 = eg.add(("let", k1), (vark2, letv1))
    return eg.add(("sum", k2, v2), (s["e1"], letk1))


def _f3_rhs(s, eg):
    k1, v1, k2, v2 = s["?k1"], s["?v1"], s["?k2"], s["?v2"]
    letv1 = eg.add(("let", v1), (s["e3"], s["e4"]))
    letk1 = eg.add(("let", k1), (s["e2"], letv1))
    return eg.add(("sum", k2, v2), (s["e1"], letk1))


def _f4_rhs(s, eg):
    k1, v1, k2, v2 = s["?k1"], s["?v1"], s["?k2"], s["?v2"]
    varv1 = eg.add(("var", v1))
    letv2 = eg.add(("let", v2), (varv1, s["e3"]))
    return eg.add(("merge", k1, k2, v1), (s["e1"], s["e2"], letv2))


def _fusion() -> list[Rule]:
    return [
        # F1: sum(<k,v> in e1) if (k == e2) then e3
        #       -> let k = e2 in let v = e1(k) in e3     (k,v not in FV(e2))
        Rule(
            "F1",
            P("sum", e1,
              P("if", P("eq", P("var", payload=("?k",)), e2), e3),
              payload=("?k", "?v")),
            _f1_rhs,
            guard=fv_guard("?k", "?v", of="e2"),
        ),
        # F2: sum(<k1,v1> in (sum(<k2,v2> in e1) {k2 -> e2})) e3
        #       -> sum(<k2,v2> in e1) let k1=k2, v1=e2 in e3
        Rule(
            "F2",
            P("sum",
              P("sum", e1,
                P("dict", P("var", payload=("?k2",)), e2, payload=("_", "_")),
                payload=("?k2", "?v2")),
              e3,
              payload=("?k1", "?v1")),
            _f2_rhs,
        ),
        # F3: sum(<k1,v1> in (sum(<k2,v2> in e1) {@unique e2 -> e3})) e4
        #       -> sum(<k2,v2> in e1) let k1=e2, v1=e3 in e4
        Rule(
            "F3",
            P("sum",
              P("sum", e1, P("dict", e2, e3, payload=(True, "_")),
                payload=("?k2", "?v2")),
              e4,
              payload=("?k1", "?v1")),
            _f3_rhs,
        ),
        # NOTE: the substitution-based fusions (iterating a sum-built or
        # singleton-dict source — the paper's deep-fusion cases) live in
        # repro.core.fuse as an AST-level pass between saturation rounds:
        # substitution cannot be expressed soundly inside the e-graph
        # (paper Sec. 5.4), and simulating it by reify-substitute-reinsert
        # proved contextually unsound (see DESIGN.md).
        # F4: sum(<k1,v1> in e1) sum(<k2,v2> in e2) if (v1==v2) then e3
        #       -> merge(<k1,k2,v1> in <e1,e2>) let v2=v1 in e3
        Rule(
            "F4",
            P("sum", e1,
              P("sum", e2,
                P("if",
                  P("eq", P("var", payload=("?v1",)),
                    P("var", payload=("?v2",))),
                  e3),
                payload=("?k2", "?v2")),
              payload=("?k1", "?v1")),
            _f4_rhs,
            guard=fv_guard("?k1", "?v1", of="e2"),
        ),
    ]


def _t4_rhs(s, eg):
    # (e1:e2)(e3) -> if (e1 <= e3) then if (e3 < e2) then e3
    leq = eg.add(("leq",), (s["e1"], s["e3"]))
    lt = eg.add(("lt",), (s["e3"], s["e2"]))
    inner = eg.add(("if",), (lt, s["e3"]))
    return eg.add(("if",), (leq, inner))


def _dict_rules() -> list[Rule]:
    kv = ("?k", "?v")
    fl = ("?u", "?p")
    return [
        # T1: sum(<k,v> in e) {k -> v} -> e   (collapse identity loop)
        Rule(
            "T1",
            P("sum", e1,
              P("dict", P("var", payload=("?k",)), P("var", payload=("?v",)),
                payload=("_", "_")),
              payload=kv),
            e1,
        ),
        Rule(
            "T2",
            P("add", P("get", e2, e1), P("get", e3, e1)),
            P("get", P("add", e2, e3), e1),
        ),
        *_both(
            "T3",
            P("add", P("dict", e1, e2, payload=fl),
              P("dict", e1, e3, payload=fl)),
            P("dict", e1, P("add", e2, e3), payload=fl),
        ),
        Rule("T4", P("get", P("range", e1, e2), e3), _t4_rhs),
        # TG: {k -> v}(k) -> v
        Rule("TG",
             P("get", P("dict", e1, e2, payload=("_", "_")), e1), e2),
        # TI: if (true) then e -> e
        Rule("TI", P("if", P("const", payload=(True,)), e1), e1),
        # TS: sum(<k,v> in e1) 0 -> 0
        Rule("TS", P("sum", e1, P("const", payload=(0,)), payload=kv),
             P("const", payload=(0,))),
        # TL: let x = e1 in e2 -> e2   (x not free in e2; dead binding)
        Rule("TL", P("let", e1, e2, payload=("?x",)), e2,
             guard=fv_guard("?x", of="e2")),
    ]


def _phys() -> list[Rule]:
    # Sec. 5.6: a logical dict must become a dense array or a hash map; the
    # cost model assigns cost infinity to any remaining logical dict.
    return [
        Rule("P-dense", P("dict", e1, e2, payload=("?u", None)),
             P("dict", e1, e2, payload=("?u", "dense"))),
        Rule("P-hash", P("dict", e1, e2, payload=("?u", None)),
             P("dict", e1, e2, payload=("?u", "hash"))),
    ]


ALL_FAMILIES = {
    "assoc": _assoc,
    "comm": _comm,
    "hoist": _hoist,
    "simplify": _simplify,
    "factor": _factor,
    "fusion": _fusion,
    "dict": _dict_rules,
    "phys": _phys,
}

LOGICAL_FAMILIES = [f for f in ALL_FAMILIES if f != "phys"]


def rules(families=None, exclude=()) -> list[Rule]:
    """Build the rule list for the given families (default: all logical +
    physical), excluding any rule whose name is in ``exclude``."""
    fams = list(families) if families is not None else list(ALL_FAMILIES)
    out = []
    for f in fams:
        out.extend(ALL_FAMILIES[f]())
    return [r for r in out if r.name not in exclude]


def logical_rules() -> list[Rule]:
    """The 44 logical rewrite rules of the paper."""
    return rules(LOGICAL_FAMILIES)


def physical_rules() -> list[Rule]:
    """The 2 physical @dense/@hash rules of Sec. 5.6."""
    return rules(["phys"])
