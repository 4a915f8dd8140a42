"""Tests for cardinality estimation (Fig. 5) and the cost model (Fig. 6)."""
import math

from repro.cost import cardinality as C
from repro.cost.model import Est, Gammas, Stats, make_costfn, seed_var_estimates
from repro.egraph.egraph import EGraph, expr_to_egraph
from repro.egraph.extract import best_expr, extract
from repro.egraph.saturate import saturate
from repro.rules.catalog import logical_rules, physical_rules
from repro.sdqlite.ast import Dict, Mul, Sum, Var
from repro.sdqlite.parser import parse
from repro.sdqlite.types import infer_var_depths


def test_card_constructors_and_pretty():
    c = C.seq(100, C.seq(10, C.seq(50)))
    assert C.pretty(c) == "100[10[50[s]]]"  # the paper's example
    assert C.outer(c) == 100
    assert C.total(c) == 100 * 10 * 50
    assert C.depth(c) == 3


def test_card_scale_matches_paper_example():
    # Fig. 5 walk-through: card(sum(<i,v> in A) if (v==25) then {i -> i*3})
    # with card(A) = 1000[s] and sel = 0.02  ==>  20[s].
    d = C.card_dict(C.S)  # {i -> i*3} : 1[s]
    assert d == (1.0, C.S)
    after_if = C.scale(d, 0.02)
    after_sum = C.scale(after_if, 1000)
    assert C.outer(after_sum) == 20.0


def test_card_add_mul():
    a, b = C.seq(10), C.seq(3)
    assert C.outer(C.card_add(a, b)) == 13
    assert C.outer(C.card_mul(a, b)) == 3
    assert C.card_mul(C.S, a) == a


def test_costfn_logical_dict_is_infinite():
    eg = EGraph()
    root = expr_to_egraph(parse("{ 1 -> x }"), eg)
    stats = Stats(var_est={"x": Est(C.S)})
    best = extract(eg, root, make_costfn(stats))
    assert math.isinf(best[eg.find(root)].cost)


def test_costfn_physical_dict_is_finite_and_dense_preferred():
    eg = EGraph()
    root = expr_to_egraph(parse("{ 1 -> x }"), eg)
    saturate(eg, physical_rules())
    stats = Stats(var_est={"x": Est(C.S)})
    best = extract(eg, root, make_costfn(stats))
    choice = best[eg.find(root)]
    assert not math.isinf(choice.cost)
    assert choice.node[0] == ("dict", False, "dense")  # cheaper than hash


def test_cost_iteration_scales_with_size():
    stats = Stats(var_est={
        "Big": Est(C.seq(10000), "dense"),
        "Small": Est(C.seq(10), "dense"),
    })

    def cost_of(src):
        eg = EGraph()
        root = expr_to_egraph(parse(src), eg)
        return extract(eg, root, make_costfn(stats))[eg.find(root)].cost

    assert cost_of("sum(<i,v> in Big) v") > 100 * cost_of("sum(<i,v> in Small) v")


def test_cost_hash_iteration_more_expensive_than_dense():
    stats = Stats(var_est={
        "D": Est(C.seq(1000), "dense"),
        "H": Est(C.seq(1000), "hash"),
    })

    def cost_of(src):
        eg = EGraph()
        root = expr_to_egraph(parse(src), eg)
        return extract(eg, root, make_costfn(stats))[eg.find(root)].cost

    assert cost_of("sum(<i,v> in H) v") > cost_of("sum(<i,v> in D) v")


def test_cost_prefers_factorized_plan():
    # sum(<i,v> in V) x * v : the factorized form x * (sum ... v) must win
    # because the per-iteration multiply disappears.
    src = "sum(<i,v> in V) x * v"
    e = parse(src)
    stats = Stats(var_est={"V": Est(C.seq(1000), "dense"), "x": Est(C.S)})
    seed_var_estimates(e, stats)
    eg = EGraph(var_depth=infer_var_depths(e, {"V": 1, "x": 0}))
    root = expr_to_egraph(e, eg)
    saturate(eg, logical_rules())
    best = extract(eg, root, make_costfn(stats))
    plan = best_expr(eg, root, best)
    # optimal plan is x * sum(<i,v> in V) v
    assert isinstance(plan, Mul)
    assert isinstance(plan.a, Var) or isinstance(plan.b, Var)


def test_cost_range_uses_constant_bounds():
    stats = Stats()

    def cost_of(src):
        eg = EGraph()
        root = expr_to_egraph(parse(src), eg)
        return extract(eg, root, make_costfn(stats))[eg.find(root)].cost

    assert cost_of("sum(<i,v> in 0:10000) v") > 10 * cost_of(
        "sum(<i,v> in 0:100) v"
    )


def test_seed_var_estimates_binder_vars():
    e = parse("sum(<i,Ai> in A) sum(<j,v> in Ai) v")
    stats = Stats(var_est={"A": Est(C.seq(100, C.seq(20)), "hash")})
    seed_var_estimates(e, stats)
    # the inner row variable must have the inner cardinality of A
    row_ests = [
        est for name, est in stats.var_est.items()
        if name.startswith("Ai%")
    ]
    assert row_ests and C.outer(row_ests[0].card) == 20


def test_let_materialization_cost():
    # Sharing through a let is cheaper than recomputing the (non-closed)
    # subexpression, but still charges gamma_mater on top of one compute.
    stats = Stats(var_est={"M": Est(C.seq(100, C.seq(50)), "dense")})

    def cost_of(src):
        e = parse(src)
        seed_var_estimates(e, stats)
        eg = EGraph(var_depth=infer_var_depths(e, {"M": 2}))
        root = expr_to_egraph(e, eg)
        return extract(eg, root, make_costfn(stats))[eg.find(root)].cost

    single = cost_of("sum(<i,row> in M) sum(<j,u> in row) u")
    with_let = cost_of(
        "sum(<i,row> in M) let t = (sum(<j,u> in row) u) in t*t"
    )
    inline = cost_of(
        "sum(<i,row> in M) (sum(<j,u> in row) u) * (sum(<j,u> in row) u)"
    )
    assert single < with_let < inline


def test_closed_aggregates_are_amortized():
    # A closed sum (a storage mapping) referenced inside loops is charged
    # as materialized-once, so a lookup plan can beat re-iteration.
    stats = Stats(var_est={"V": Est(C.seq(1000), "dense")})

    def cost_of(src):
        e = parse(src)
        seed_var_estimates(e, stats)
        eg = EGraph(var_depth=infer_var_depths(e, {"V": 1}))
        root = expr_to_egraph(e, eg)
        return extract(eg, root, make_costfn(stats))[eg.find(root)].cost

    closed_use = cost_of(
        "sum(<i,v> in 0:1000) (sum(<j,u> in V) { @unique @dense j -> 2*u })(i)"
    )
    reiterate = cost_of(
        "sum(<i,v> in 0:1000) sum(<j,u> in V) if (j == i) then 2*u"
    )
    assert closed_use < reiterate


def test_gammas_defaults_ordering():
    g = Gammas()
    assert g.iter_dense < g.iter_hash
    assert g.lookup_dense < g.lookup_hash
    assert g.insert_dense < g.insert_hash
