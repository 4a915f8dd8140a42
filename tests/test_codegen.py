"""Code-generator tests: generated Python loop nests must agree with the
reference interpreter on every construct and full kernels."""
import numpy as np
import pytest

from repro.core import reference as ref
from repro.core.compile import Limits, compile_kernel
from repro.core.kernels import KERNELS
from repro.exec.codegen import array_names, compile_plan, prepare_env, run_plan
from repro.sdqlite.interp import approx_eq, canon, interp
from repro.sdqlite.parser import parse
from repro.storage.coo import random_sparse
from repro.storage.formats import store

LIM = Limits(max_iters=8, max_nodes=8000, timeout_s=8)


def _agree(src, env, depths=None):
    e = parse(src)
    want = interp(e, env)
    got = run_plan(e, env, depths)
    assert approx_eq(got, want), f"{src}\n{got} vs {want}"


def test_codegen_scalar_arith():
    _agree("1 + 2 * 3 - 4", {})


def test_codegen_sum_over_dict():
    _agree("sum(<i,v> in V) v", {"V": {0: 1.0, 5: 2.5}})


def test_codegen_sum_over_range():
    _agree("sum(<i,v> in 0:10) v", {})
    _agree("sum(<i,v> in 0:10) { i -> i*2 }", {})


def test_codegen_sum_over_array():
    _agree("sum(<i,v> in V) { i -> 2*v }", {"V": np.array([1.0, 0.0, 3.0])})


def test_codegen_subarray_loop():
    env = {"V": np.array([10.0, 20.0, 30.0, 40.0])}
    _agree("sum(<p,v> in V(1:3)) v", env)


def test_codegen_lookup_forms():
    env = {"A": {1: {2: 5.0}}, "V": np.array([7.0, 8.0])}
    _agree("A(1)(2)", env)
    _agree("A(1,2)", env)
    _agree("V(1)", env)
    _agree("A(9)(9)", env)  # missing -> 0


def test_codegen_if_and_let():
    _agree("let a = 3 in if (a < 5) then a*2", {})


def test_codegen_nested_dict_accumulate():
    src = "sum(<(i,j),v> in A) { (j,i) -> v }"  # transpose
    A = {0: {1: 2.0, 2: 3.0}, 4: {1: 7.0}}
    _agree(src, {"A": A})


def test_codegen_dict_valued_product():
    # row-dict times scalar inside a sum (the factorized BATAX shape)
    src = "sum(<i,row> in A) row * 2"
    A = {0: {1: 2.0}, 3: {0: 1.0, 1: 5.0}}
    _agree(src, {"A": A})


def test_codegen_merge():
    src = None
    from repro.sdqlite.ast import Dict, Merge, Var, Const
    e = Merge("p", "q", "c", Var("e1"), Var("e2"), Dict(Var("c"), Const(1)))
    env = {"e1": {0: 3, 1: 5}, "e2": {0: 5, 1: 4, 2: 3}}
    got = run_plan(e, env)
    assert canon(got) == canon(interp(e, env))


def test_codegen_csr_tsm_roundtrip():
    st = store("C", random_sparse((8, 9), 0.3, seed=1), "csr")
    e = parse(st.tsm_src)
    got = run_plan(e, st.env, st.depths)
    assert approx_eq(got, interp(e, st.env))


@pytest.mark.parametrize("kname,fmts,shapes", [
    ("MMM", {"A": "csr", "B": "csr"}, {"A": (9, 8), "B": (8, 7)}),
    ("SumMMM", {"A": "csc", "B": "csr"}, {"A": (9, 8), "B": (8, 7)}),
    ("BATAX", {"A": "csr", "x": "dense"}, {"A": (9, 9), "x": (9,)}),
    ("TTM", {"A": "csf", "B": "csr"}, {"A": (4, 5, 6), "B": (7, 6)}),
    ("MTTKRP", {"B": "csf", "C": "csr", "D": "csr"},
     {"B": (4, 5, 6), "C": (5, 7), "D": (6, 7)}),
])
def test_codegen_full_kernels_match_interpreter(kname, fmts, shapes):
    k = KERNELS[kname]
    stored = {
        n: store(n, random_sparse(shapes[n], 0.3, seed=i), fmts[n])
        for i, (n, _r) in enumerate(k.tensors)
    }
    scal = {"beta": 2.0} if kname == "BATAX" else None
    c = compile_kernel(k, stored, scalar_env=scal, limits=LIM)
    got_opt = run_plan(c.plan, c.env, c.gdepth)
    got_naive = run_plan(c.naive, c.env, c.gdepth)
    want = interp(c.plan, c.env)
    assert approx_eq(got_opt, want, 1e-6)
    assert approx_eq(got_naive, want, 1e-6)


def test_codegen_hoists_closed_aggregations():
    # the naive plan references the same TSM twice; codegen must
    # materialize it once in the prelude, not per loop iteration
    st = store("A", random_sparse((6, 6), 0.4, seed=2), "csr")
    k = KERNELS["BATAX"]
    xst = store("x", random_sparse((6,), 1.0, seed=3), "dense")
    c = compile_kernel(
        k, {"A": st, "x": xst}, scalar_env={"beta": 1.0}, limits=LIM
    )
    ck = compile_plan(c.naive, c.gdepth, array_names(c.env))
    # count materializations of the A TSM: the prelude should contain the
    # row loop exactly once per distinct closed aggregation
    assert ck.source.count("def _kernel") == 1
    got = ck(prepare_env(c.env))
    want = ref.batax(1.0, st.coo.to_dense(), xst.coo.to_dense())
    assert np.allclose(ref.nested_to_dense(canon(got), (6,)), want)


def test_compiled_kernel_reusable():
    e = parse("sum(<i,v> in V) v*v")
    ck = compile_plan(e, {"V": 1}, {"V"})
    assert ck({"V": {0: 2.0}}) == 4.0
    assert ck({"V": {0: 3.0}}) == 9.0
