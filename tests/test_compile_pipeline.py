"""End-to-end optimizer tests: for every kernel and a matrix of storage
formats, the optimized physical plan must compute exactly what the naive
composed plan and the dense NumPy closed form compute."""
import numpy as np
import pytest

from repro.core import reference as ref
from repro.core.compile import Limits, compile_kernel, logical_est
from repro.core.kernels import KERNELS
from repro.cost import cardinality as C
from repro.sdqlite.interp import approx_eq, canon, interp
from repro.storage.coo import random_sparse
from repro.storage.formats import store

LIM = Limits(max_iters=8, max_nodes=8000, timeout_s=8)


def _compile(kname, fmts, shapes, seed=0, scalar_env=None, **kw):
    kernel = KERNELS[kname]
    stored = {}
    for (name, rank), fmt in zip(kernel.tensors, fmts):
        coo = random_sparse(shapes[name], 0.3, seed=seed + hash(name) % 97)
        stored[name] = store(name, coo, fmt)
    c = compile_kernel(
        kernel, stored, scalar_env=scalar_env, limits=LIM, **kw
    )
    return c, stored


def _dense(stored, name):
    return stored[name].coo.to_dense()


@pytest.mark.parametrize("fa,fb", [
    ("csr", "csr"), ("csr", "csc"), ("dcsr", "csr"), ("hash", "hash"),
    ("dense", "dense"), ("coo", "coo"),
])
def test_mmm_plan_correct(fa, fb):
    c, stored = _compile("MMM", [fa, fb], {"A": (6, 5), "B": (5, 7)})
    got = canon(interp(c.plan, c.env))
    want = canon(interp(c.naive, c.env))
    assert approx_eq(got, want)
    dense = ref.nested_to_dense(got, (6, 7))
    assert np.allclose(dense, ref.mmm(_dense(stored, "A"), _dense(stored, "B")))


@pytest.mark.parametrize("fa,fb", [
    ("csc", "csr"), ("csr", "csr"), ("hash", "hash"), ("dense", "dense"),
])
def test_sum_mmm_plan_correct(fa, fb):
    c, stored = _compile("SumMMM", [fa, fb], {"A": (6, 5), "B": (5, 7)})
    got = interp(c.plan, c.env)
    want = ref.sum_mmm(_dense(stored, "A"), _dense(stored, "B"))
    assert approx_eq(got, want)


@pytest.mark.parametrize("fa,fx", [
    ("csr", "dense"), ("hash", "dense"), ("dense", "dense"),
    ("dcsr", "sparse"),
])
def test_batax_plan_correct(fa, fx):
    c, stored = _compile(
        "BATAX", [fa, fx], {"A": (7, 7), "x": (7,)}, scalar_env={"beta": 3.0}
    )
    got = canon(interp(c.plan, c.env))
    want = ref.batax(3.0, _dense(stored, "A"), _dense(stored, "x"))
    assert np.allclose(ref.nested_to_dense(got, (7,)), want)


@pytest.mark.parametrize("fa,fb", [("csf", "csr"), ("csf", "csc"),
                                   ("coo", "coo"), ("hash", "hash")])
def test_ttm_plan_correct(fa, fb):
    c, stored = _compile("TTM", [fa, fb], {"A": (4, 3, 5), "B": (6, 5)})
    got = canon(interp(c.plan, c.env))
    want = ref.ttm(_dense(stored, "A"), _dense(stored, "B"))
    assert np.allclose(ref.nested_to_dense(got, (4, 3, 6)), want)


@pytest.mark.parametrize("fb,fc,fd", [
    ("csf", "csr", "csc"), ("csf", "csr", "csr"), ("coo", "coo", "coo"),
])
def test_mttkrp_plan_correct(fb, fc, fd):
    c, stored = _compile(
        "MTTKRP", [fb, fc, fd],
        {"B": (4, 3, 5), "C": (3, 6), "D": (5, 6)},
    )
    got = canon(interp(c.plan, c.env))
    want = ref.mttkrp(
        _dense(stored, "B"), _dense(stored, "C"), _dense(stored, "D")
    )
    assert np.allclose(ref.nested_to_dense(got, (4, 6)), want)


def test_stage_stats_has_two_rows():
    c, _ = _compile("SumMMM", ["csr", "csr"], {"A": (5, 5), "B": (5, 5)})
    assert len(c.stage_stats) == 2
    for s in c.stage_stats:
        t, iters, nodes, classes, memos = s.row()
        assert iters >= 1 and nodes > 0 and classes > 0 and memos >= nodes


def test_factorization_lowers_cost():
    # Disabling the factorization families must not yield a cheaper plan.
    full, _ = _compile("BATAX", ["hash", "dense"],
                       {"A": (8, 8), "x": (8,)}, scalar_env={"beta": 1.0})
    nofac, _ = _compile(
        "BATAX", ["hash", "dense"], {"A": (8, 8), "x": (8,)},
        scalar_env={"beta": 1.0},
        families=["assoc", "comm", "simplify", "dict", "fusion"],
    )
    assert full.cost <= nofac.cost


def test_ablated_plans_still_correct():
    c, stored = _compile(
        "BATAX", ["hash", "dense"], {"A": (6, 6), "x": (6,)},
        scalar_env={"beta": 2.0},
        families=["assoc", "comm", "simplify", "dict"],
    )
    got = canon(interp(c.plan, c.env))
    want = ref.batax(2.0, _dense(stored, "A"), _dense(stored, "x"))
    assert np.allclose(ref.nested_to_dense(got, (6,)), want)


def test_logical_est_shapes():
    st = store("A", random_sparse((10, 8), 0.25, seed=3), "csr")
    est = logical_est(st)
    assert C.depth(est.card) == 2
    assert C.total(est.card) == pytest.approx(st.coo.nnz, rel=0.01)


def test_plan_is_closed():
    from repro.sdqlite.ast import free_vars
    c, _ = _compile("MMM", ["csr", "csr"], {"A": (5, 5), "B": (5, 5)})
    assert free_vars(c.plan) <= set(c.env)
