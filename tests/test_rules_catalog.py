"""Tests for the rewrite-rule catalog (Fig. 3): rule counts, targeted
per-rule behaviour, and randomized semantics-preservation sampling."""
import random

import pytest

from repro.egraph.egraph import EGraph, expr_to_egraph
from repro.egraph.extract import best_expr, extract, random_costfn, size_costfn
from repro.egraph.saturate import saturate
from repro.rules.catalog import logical_rules, physical_rules, rules
from repro.sdqlite.ast import free_vars
from repro.sdqlite.interp import canon, interp
from repro.sdqlite.parser import parse
from repro.sdqlite.types import infer_var_depths


def test_rule_counts_match_paper():
    assert len(logical_rules()) == 44  # paper Sec. 5.2: "about 44 rules"
    assert len(physical_rules()) == 2  # paper Sec. 5.6


def _saturated(src, fams=None, env_depths=None, **kw):
    e = parse(src)
    eg = EGraph(
        var_depth=infer_var_depths(e, env_depths or {})
    )
    root = expr_to_egraph(e, eg)
    rs = rules(fams) if fams else logical_rules()
    stats = saturate(eg, rs, **kw)
    return e, eg, root, stats


def _has_op(eg, cid, opname):
    return any(n[0][0] == opname for n in eg.nodes[eg.find(cid)])


# -- targeted rule behaviour -------------------------------------------------

def test_mul_assoc_comm_generate_all_orders():
    _, eg, root, st = _saturated("a * (b * c)", fams=["assoc", "comm"])
    assert st.saturated
    for variant in ["(a*b)*c", "c*(a*b)", "(c*b)*a", "b*(a*c)"]:
        vid = expr_to_egraph(parse(variant), eg)
        assert eg.find(vid) == eg.find(root), variant


def test_simplify_constant_folding_shapes():
    _, eg, root, _ = _saturated("(x + 0) * 1", fams=["simplify"])
    xid = expr_to_egraph(parse("x"), eg)
    assert eg.find(root) == eg.find(xid)


def test_sub_self_is_zero():
    _, eg, root, _ = _saturated("x - x", fams=["simplify"])
    zid = expr_to_egraph(parse("0"), eg)
    assert eg.find(root) == eg.find(zid)


def test_d1_factorization():
    _, eg, root, _ = _saturated("a*b + a*c", fams=["factor"])
    fid = expr_to_egraph(parse("a*(b+c)"), eg)
    assert eg.find(root) == eg.find(fid)


def test_d2_hoists_loop_invariant():
    # sum(<i,v> in V) x * v  ==  x * sum(<i,v> in V) v
    _, eg, root, _ = _saturated("sum(<i,v> in V) x * v", fams=["factor"])
    assert _has_op(eg, root, "mul")


def test_d2_respects_binding():
    _, eg, root, _ = _saturated("sum(<i,v> in V) v * v", fams=["factor"])
    assert not _has_op(eg, root, "mul")


def test_d4_hoists_dict_out_of_sum():
    # sum(<k,v> in V) { 7 -> v }  ==  { 7 -> sum(<k,v> in V) v }
    _, eg, root, _ = _saturated("sum(<k,v> in V) { 7 -> v }", fams=["factor"])
    assert _has_op(eg, root, "dict")


def test_a2_requires_scalar_factor():
    # {k -> a*B} with B a dict must NOT be rewritten to {k -> a} * B.
    e = parse("{ 1 -> a * B }")
    eg = EGraph(var_depth={"a": 0, "B": 1})
    root = expr_to_egraph(e, eg)
    saturate(eg, rules(["hoist"]))
    # A3 (hoisting the scalar a) is fine; A2 hoisting the dict B is not:
    bid = expr_to_egraph(parse("B"), eg)
    unsound = [
        n for n in eg.nodes[eg.find(root)]
        if n[0][0] == "mul" and eg.find(bid) in map(eg.find, n[1])
    ]
    assert not unsound
    # while {k -> a*b} with scalars CAN:
    e2 = parse("{ 1 -> a * b }")
    eg2 = EGraph(var_depth={"a": 0, "b": 0})
    r2 = expr_to_egraph(e2, eg2)
    saturate(eg2, rules(["hoist"]))
    assert _has_op(eg2, r2, "mul")


def test_f1_iteration_to_lookup():
    # Example 5.1: sum over V with an equality filter becomes a lookup.
    src = "sum(<i,a> in A) sum(<j,b> in B) if (i==j) then a*b"
    _, eg, root, _ = _saturated(src, fams=["comm", "fusion"])
    # the inner sum's class must now contain a let (the fused lookup)
    A = {0: 2.0, 5: 3.0}
    B = {0: 10.0, 5: 100.0, 7: 1.0}
    got = interp(parse(src), {"A": A, "B": B})
    assert got == 320.0


def test_f1_rhs_is_equivalent():
    src = "sum(<i,a> in A) sum(<j,b> in B) if (j==i) then a*b"
    e, eg, root, _ = _saturated(src, fams=["comm", "fusion"])
    env = {"A": {0: 2.0, 5: 3.0}, "B": {0: 10.0, 5: 100.0}}
    rng = random.Random(7)
    for _ in range(5):
        best = extract(eg, root, random_costfn(rng))
        plan = best_expr(eg, root, best)
        assert canon(interp(plan, env)) == canon(interp(e, env))


def test_f3_unique_fusion_fuses_csr_iteration():
    # Iterating a sum-constructed @unique dict fuses into a single loop.
    src = """
      sum(<r,rv> in (sum(<i,v> in V) { @unique i -> 2*v })) { r -> rv }
    """
    e, eg, root, _ = _saturated(src, fams=["fusion"])
    env = {"V": {1: 5.0, 3: 7.0}}
    assert canon(interp(e, env)) == {1: 10.0, 3: 14.0}
    # after fusion the root class contains a sum over V directly
    fused = [
        n for n in eg.nodes[eg.find(root)]
        if n[0][0] == "sum"
        and eg.find(n[1][0]) == eg.find(expr_to_egraph(parse("V"), eg))
    ]
    assert fused


def test_f4_merge_creation():
    src = """
      sum(<p,x> in I1) sum(<q,y> in I2) if (x==y) then { x -> 1 }
    """
    e, eg, root, _ = _saturated(src, fams=["fusion"])
    assert _has_op(eg, root, "merge")
    env = {"I1": {0: 3, 1: 5}, "I2": {0: 5, 1: 4, 2: 3}}
    rng = random.Random(1)
    for _ in range(4):
        best = extract(eg, root, random_costfn(rng))
        plan = best_expr(eg, root, best)
        assert canon(interp(plan, env)) == canon(interp(e, env))


def test_t1_collapses_identity_loop():
    _, eg, root, _ = _saturated("sum(<k,v> in V) { k -> v }", fams=["dict"])
    vid = expr_to_egraph(parse("V"), eg)
    assert eg.find(root) == eg.find(vid)


def test_t4_range_lookup():
    _, eg, root, _ = _saturated("(2:9)(x)", fams=["dict"])
    assert _has_op(eg, root, "if")
    env = {"x": 4}
    assert interp(parse("(2:9)(4)"), {}) == 4
    assert interp(parse("(2:9)(11)"), {}) == 0


def test_tl_dead_let_elimination():
    _, eg, root, _ = _saturated("let t = x * y in 5", fams=["dict"])
    five = expr_to_egraph(parse("5"), eg)
    assert eg.find(root) == eg.find(five)


def test_phys_rules_tag_dicts():
    e = parse("{ 1 -> x }")
    eg = EGraph()
    root = expr_to_egraph(e, eg)
    saturate(eg, physical_rules())
    phys = {n[0][2] for n in eg.nodes[eg.find(root)] if n[0][0] == "dict"}
    assert phys == {None, "dense", "hash"}


# -- randomized semantics preservation over kernel-shaped programs -----------

PROGRAMS = [
    # (name, source, env, var depths for globals)
    (
        "scale-filter",
        "sum(<i,v> in V) if (0 < v) then { i -> 5*v }",
        {"V": {0: 2.0, 1: -1.0, 2: 3.0}},
        {"V": 1},
    ),
    (
        "dot",
        "sum(<i,u> in U, <i,v> in V) u*v",
        {"U": {0: 1.0, 1: 2.0, 3: 4.0}, "V": {0: 3.0, 1: 4.0, 2: 9.0}},
        {"U": 1, "V": 1},
    ),
    (
        "batax-trie",
        """
        sum(<i,Ai> in A) sum(<j,Aij> in Ai) sum(<k,Aik> in Ai)
          { j -> beta * Aij * Aik * x(k) }
        """,
        {
            "A": {0: {0: 1.0, 2: 2.0}, 1: {1: 3.0}},
            "x": {0: 1.0, 1: 2.0, 2: 3.0},
            "beta": 2.0,
        },
        {"A": 2, "x": 1, "beta": 0},
    ),
    (
        "sum-mmm",
        """
        sum(<i,rA> in A) sum(<j,a> in rA)
          sum(<j2,rB> in B) sum(<k,b> in rB)
            if (j==j2) then a*b
        """,
        {
            "A": {0: {0: 1.0, 1: 2.0}, 1: {1: 4.0}},
            "B": {0: {0: 5.0}, 1: {0: 7.0, 1: 8.0}},
        },
        {"A": 2, "B": 2},
    ),
]


@pytest.mark.parametrize("name,src,env,depths", PROGRAMS)
def test_random_plans_preserve_semantics(name, src, env, depths):
    e = parse(src)
    eg = EGraph(var_depth=infer_var_depths(e, depths))
    root = expr_to_egraph(e, eg)
    saturate(eg, logical_rules(), max_iters=6, max_nodes=4000, timeout_s=10)
    expected = canon(interp(e, env))
    rng = random.Random(42)
    for trial in range(6):
        best = extract(eg, root, random_costfn(rng))
        plan = best_expr(eg, root, best)
        assert free_vars(plan) <= set(env), f"{name}: unbound vars in plan"
        got = canon(interp(plan, env))
        assert got == expected, f"{name} trial {trial}:\n{plan}"


def test_smallest_plan_is_equivalent_and_no_bigger():
    src = "sum(<i,v> in V) x * v"
    e = parse(src)
    eg = EGraph(var_depth=infer_var_depths(e, {"V": 1, "x": 0}))
    root = expr_to_egraph(e, eg)
    saturate(eg, logical_rules(), max_iters=6, max_nodes=2000)
    best = extract(eg, root, size_costfn)
    plan = best_expr(eg, root, best)
    env = {"V": {0: 1.0, 2: 5.0}, "x": 3.0}
    assert canon(interp(plan, env)) == canon(interp(e, env))
