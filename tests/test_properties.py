"""Hypothesis property tests: semiring laws of the interpreter's value
algebra, codegen/interpreter agreement on random programs, and storage
round-trips on random matrices."""
import numpy as np
from hypothesis import given, settings, strategies as st

from repro.exec.runtime import add_val, mul_val
from repro.exec.codegen import run_plan
from repro.sdqlite.interp import approx_eq, canon, interp, sr_add, sr_mul
from repro.sdqlite.parser import parse
from repro.storage.coo import COO, from_dense, to_nested
from repro.storage.formats import store

# bounded away from zero: products of denormals underflow to exact 0.0,
# which canon() drops on one side of an identity but not the other
scalars = st.one_of(
    st.just(0.0),
    st.floats(min_value=0.01, max_value=100),
    st.floats(min_value=-100, max_value=-0.01),
)
vec = st.dictionaries(st.integers(0, 6), scalars, max_size=5)
value = st.one_of(scalars, vec)


@given(value, value)
@settings(max_examples=50, deadline=None)
def test_sr_add_commutative(a, b):
    if _mixed(a, b):
        return
    assert canon(sr_add(a, b)) == canon(sr_add(b, a))


@given(vec, vec, vec)
@settings(max_examples=50, deadline=None)
def test_sr_add_associative(a, b, c):
    l = sr_add(sr_add(a, b), c)
    r = sr_add(a, sr_add(b, c))
    assert approx_eq(l, r, 1e-9)


@given(vec, vec)
@settings(max_examples=50, deadline=None)
def test_sr_mul_commutative_on_dicts(a, b):
    assert approx_eq(sr_mul(a, b), sr_mul(b, a), 1e-9)


@given(scalars, vec, vec)
@settings(max_examples=50, deadline=None)
def test_sr_mul_distributes(s, a, b):
    l = sr_mul(s, sr_add(a, b))
    r = sr_add(sr_mul(s, a), sr_mul(s, b))
    assert approx_eq(l, r, 1e-6)


@given(vec, vec)
@settings(max_examples=50, deadline=None)
def test_runtime_matches_interp_semiring(a, b):
    assert approx_eq(add_val(a, b), sr_add(a, b), 1e-9)
    assert approx_eq(mul_val(a, b), sr_mul(a, b), 1e-9)


def _mixed(a, b):
    ad, bd = isinstance(a, dict), isinstance(b, dict)
    if ad != bd:
        return not ((not ad and a == 0) or (not bd and b == 0))
    return False


PROGRAMS = [
    "sum(<i,v> in V) v",
    "sum(<i,v> in V) { i -> 3*v }",
    "sum(<i,v> in V) if (0 < v) then { i -> v }",
    "sum(<i,u> in U, <i,v> in V) u*v",
    "sum(<i,u> in U) u * sum(<j,v> in V) v",
]


@given(vec, vec, st.sampled_from(PROGRAMS))
@settings(max_examples=60, deadline=None)
def test_codegen_agrees_with_interpreter(U, V, src):
    env = {"U": U, "V": V}
    e = parse(src)
    assert approx_eq(run_plan(e, env), interp(e, env), 1e-6)


@given(
    st.integers(2, 8), st.integers(2, 8), st.integers(0, 10_000),
    st.sampled_from(["csr", "csc", "dcsr", "coo", "dense", "hash"]),
)
@settings(max_examples=40, deadline=None)
def test_storage_roundtrip_random(m, n, seed, fmt):
    rng = np.random.default_rng(seed)
    dense = (rng.random((m, n)) > 0.5) * (rng.random((m, n)) + 0.1)
    coo = from_dense(dense)
    st_ = store("T", coo, fmt)
    assert approx_eq(
        canon(interp(parse(st_.tsm_src), dict(st_.env))),
        canon(to_nested(coo)),
        1e-9,
    )
