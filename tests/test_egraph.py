"""Tests for the equality-saturation engine (the Egg substitute)."""
from repro.egraph.egraph import EGraph, expr_to_egraph, extract_expr
from repro.egraph.pattern import P, PVar, Rule, fv_guard, instantiate, match
from repro.egraph.saturate import saturate
from repro.sdqlite.parser import parse
from repro.sdqlite.ast import Add, Const, Mul, Var


def _add_expr(eg, src):
    return expr_to_egraph(parse(src), eg)


def test_hashcons_dedups():
    eg = EGraph()
    a1 = _add_expr(eg, "x + y")
    a2 = _add_expr(eg, "x + y")
    assert eg.find(a1) == eg.find(a2)
    assert eg.n_classes() == 3  # x, y, x+y


def test_merge_unions_classes():
    eg = EGraph()
    a = _add_expr(eg, "x")
    b = _add_expr(eg, "y")
    assert eg.find(a) != eg.find(b)
    eg.merge(a, b)
    assert eg.find(a) == eg.find(b)


def test_congruence_closure():
    # x = y implies f(x) = f(y): here (x+1) and (y+1) after merging x,y.
    eg = EGraph()
    fx = _add_expr(eg, "x + 1")
    fy = _add_expr(eg, "y + 1")
    x, y = _add_expr(eg, "x"), _add_expr(eg, "y")
    assert eg.find(fx) != eg.find(fy)
    eg.merge(x, y)
    eg.rebuild()
    assert eg.find(fx) == eg.find(fy)


def test_fv_analysis_basic():
    eg = EGraph()
    cid = _add_expr(eg, "x * y")
    assert eg.fv[eg.find(cid)] == {"x", "y"}


def test_fv_analysis_binder():
    eg = EGraph()
    cid = _add_expr(eg, "sum(<i,v> in V) v * x")
    assert eg.fv[eg.find(cid)] == {"V", "x"}


def test_fv_analysis_shrinks_on_merge():
    # Merging the class of (x - x) with the class of 0 shrinks its FV to {}.
    eg = EGraph()
    sub = _add_expr(eg, "x - x")
    zero = _add_expr(eg, "0")
    assert eg.fv[eg.find(sub)] == {"x"}
    eg.merge(sub, zero)
    eg.rebuild()
    assert eg.fv[eg.find(sub)] == frozenset()


def test_fv_propagates_upward_on_merge():
    eg = EGraph()
    outer = _add_expr(eg, "(x - x) * y")
    sub = _add_expr(eg, "x - x")
    eg.merge(sub, _add_expr(eg, "0"))
    eg.rebuild()
    assert eg.fv[eg.find(outer)] == {"y"}


def test_match_simple_pattern():
    eg = EGraph()
    cid = _add_expr(eg, "a * (b + c)")
    pat = P("mul", PVar("x"), P("add", PVar("y"), PVar("z")))
    subs = list(match(pat, cid, eg, {}))
    assert len(subs) == 1
    s = subs[0]
    assert eg.fv[eg.find(s["x"])] == {"a"}


def test_match_nonlinear_pattern():
    eg = EGraph()
    ok = _add_expr(eg, "a * a")
    no = _add_expr(eg, "a * b")
    pat = P("mul", PVar("x"), PVar("x"))
    assert len(list(match(pat, ok, eg, {}))) == 1
    assert len(list(match(pat, no, eg, {}))) == 0


def test_match_payload_wildcard():
    eg = EGraph()
    cid = _add_expr(eg, "sum(<i,v> in V) v")
    pat = P("sum", PVar("src"), PVar("body"), payload=("?k", "?v"))
    subs = list(match(pat, cid, eg, {}))
    assert len(subs) == 1
    assert subs[0]["?k"].startswith("i%")
    assert subs[0]["?v"].startswith("v%")


def test_instantiate_builds_nodes():
    eg = EGraph()
    a, b = _add_expr(eg, "a"), _add_expr(eg, "b")
    rhs = P("add", PVar("y"), PVar("x"))
    cid = instantiate(rhs, {"x": a, "y": b}, eg)
    direct = _add_expr(eg, "b + a")
    assert eg.find(cid) == eg.find(direct)


def test_rule_commutativity_saturates():
    eg = EGraph()
    root = _add_expr(eg, "a + b")
    comm = Rule("C1", P("add", PVar("x"), PVar("y")),
                P("add", PVar("y"), PVar("x")))
    stats = saturate(eg, [comm])
    assert stats.saturated
    flipped = _add_expr(eg, "b + a")
    assert eg.find(root) == eg.find(flipped)


def test_rule_with_fv_guard_fires_only_when_safe():
    # D2-style: sum(<k,v> in e1) x * e3  ->  x * sum(<k,v> in e1) e3
    # only if k,v not free in x.
    hoist = Rule(
        "D2",
        P("sum", PVar("e1"), P("mul", PVar("e2"), PVar("e3")),
          payload=("?k", "?v")),
        P("mul", PVar("e2"),
          P("sum", PVar("e1"), PVar("e3"), payload=("?k", "?v"))),
        guard=fv_guard("?k", "?v", of="e2"),
    )
    eg = EGraph()
    good = _add_expr(eg, "sum(<i,v> in V) x * v")
    stats = saturate(eg, [hoist])
    assert stats.saturated
    # the hoisted form must now be in the same class
    found = any(
        n[0][0] == "mul" for n in eg.nodes[eg.find(good)]
    )
    assert found

    eg2 = EGraph()
    bad = _add_expr(eg2, "sum(<i,v> in V) v * v")
    saturate(eg2, [hoist])
    assert not any(n[0][0] == "mul" for n in eg2.nodes[eg2.find(bad)])


def test_saturation_stats_shape():
    eg = EGraph()
    _add_expr(eg, "a + b")
    stats = saturate(eg, [])
    assert stats.iterations == 1 and stats.saturated
    assert stats.nodes == 3 and stats.classes == 3
    assert stats.memos >= stats.nodes
    assert isinstance(stats.time_ms, float)


def test_extract_expr_roundtrip():
    eg = EGraph()
    e = parse("a * (b + c)")
    root = expr_to_egraph(e, eg)
    # choose the only node of every class
    choice = {cid: next(iter(ns)) for cid, ns in eg.classes()}
    back = extract_expr(eg, root, choice)
    assert back == e


def test_node_cap_stops_explosion():
    # assoc both ways can blow up; the node cap must stop it
    assoc1 = Rule(
        "A1", P("mul", PVar("a"), P("mul", PVar("b"), PVar("c"))),
        P("mul", P("mul", PVar("a"), PVar("b")), PVar("c")))
    assoc2 = Rule(
        "A1r", P("mul", P("mul", PVar("a"), PVar("b")), PVar("c")),
        P("mul", PVar("a"), P("mul", PVar("b"), PVar("c"))))
    comm = Rule("C", P("mul", PVar("a"), PVar("b")),
                P("mul", PVar("b"), PVar("a")))
    eg = EGraph()
    expr_to_egraph(parse("a*(b*(c*(d*(e*(f*g)))))"), eg)
    stats = saturate(eg, [assoc1, assoc2, comm], max_nodes=500, timeout_s=2)
    assert stats.nodes <= 5000  # bounded (cap checked per iteration)
