"""Unit tests for the SDQLite reference interpreter (paper Sec. 3.2)."""
import numpy as np
import pytest

from repro.sdqlite.ast import (
    Add, Const, Dict, Eq, Get, If, Let, Lt, Merge, Mul, Neg, Prim, Range,
    Sub, SubArr, Sum, Var,
)
from repro.sdqlite.interp import canon, interp, sr_add, sr_mul


def test_const_and_var():
    assert interp(Const(3), {}) == 3
    assert interp(Var("x"), {"x": 7}) == 7


def test_unbound_var_raises():
    with pytest.raises(NameError):
        interp(Var("nope"), {})


def test_scalar_arith():
    env = {"a": 4, "b": 2}
    assert interp(Add(Var("a"), Var("b")), env) == 6
    assert interp(Mul(Var("a"), Var("b")), env) == 8
    assert interp(Sub(Var("a"), Var("b")), env) == 2
    assert interp(Neg(Var("a")), env) == -4


def test_comparisons():
    assert interp(Eq(Const(1), Const(1)), {}) is True
    assert interp(Lt(Const(1), Const(2)), {}) is True
    assert interp(Lt(Const(2), Const(1)), {}) is False


def test_dict_singleton():
    assert interp(Dict(Const(3), Const(5)), {}) == {3: 5}


def test_get_with_default_zero():
    d = {1: 10}
    assert interp(Get(Var("d"), Const(1)), {"d": d}) == 10
    assert interp(Get(Var("d"), Const(2)), {"d": d}) == 0


def test_get_numpy_array():
    a = np.array([9.0, 0.0, 7.0])
    assert interp(Get(Var("a"), Const(2)), {"a": a}) == 7.0
    assert interp(Get(Var("a"), Const(99)), {"a": a}) == 0


def test_range():
    assert interp(Range(Const(2), Const(5)), {}) == {2: 2, 3: 3, 4: 4}
    assert interp(Range(Const(3), Const(3)), {}) == {}


def test_subarray_is_segment():
    a = np.array([10, 20, 30, 40, 50])
    got = interp(SubArr(Var("a"), Const(1), Const(4)), {"a": a})
    assert got == {1: 20, 2: 30, 3: 40}


def test_if_returns_zero_when_false():
    assert interp(If(Const(False), Const(42)), {}) == 0
    assert interp(If(Const(True), Const(42)), {}) == 42


def test_let():
    e = Let("x", Const(5), Mul(Var("x"), Var("x")))
    assert interp(e, {}) == 25


def test_sum_of_singletons_groups_by_key():
    # Paper Sec. 2: addition of dictionaries acts like a group-by.
    src = {0: 1.0, 1: 2.0, 2: 3.0}
    e = Sum("k", "v", Var("V"), Dict(Const(7), Var("v")))
    assert interp(e, {"V": src}) == {7: 6.0}


def test_sum_positive_filter_example():
    # The SDQL example from Sec. 2: drop negatives, multiply by 5.
    V = {0: 2.0, 1: -1.0, 2: -3.0, 3: 4.0, 4: 5.0}
    e = Sum(
        "i", "v", Var("V"),
        If(Lt(Const(0), Var("v")), Dict(Var("i"), Mul(Const(5), Var("v")))),
    )
    assert canon(interp(e, {"V": V})) == {0: 10.0, 3: 20.0, 4: 25.0}


def test_dot_product():
    U = {0: 1.0, 1: 2.0}
    V = {0: 3.0, 1: 4.0, 2: 9.0}
    e = Sum(
        "i", "u", Var("U"),
        Sum("j", "v", Var("V"),
            If(Eq(Var("i"), Var("j")), Mul(Var("u"), Var("v")))),
    )
    assert interp(e, {"U": U, "V": V}) == 11.0


def test_nested_dict_matmul_semantics():
    # 2x2 matrices as nested dicts; element-wise semiring product/addition.
    A = {0: {0: 1.0, 1: 2.0}, 1: {0: 3.0, 1: 4.0}}
    B = {0: {0: 5.0, 1: 6.0}, 1: {0: 7.0, 1: 8.0}}
    e = Sum(
        "i", "rA", Var("A"),
        Sum("j", "a", Var("rA"),
            Sum("k", "b", Get(Var("B"), Var("j")),
                Dict(Var("i"), Dict(Var("k"), Mul(Var("a"), Var("b")))))),
    )
    got = canon(interp(e, {"A": A, "B": B}))
    assert got == {0: {0: 19.0, 1: 22.0}, 1: {0: 43.0, 1: 50.0}}


def test_merge_equal_values():
    # merge joins entries with equal *values* (Sec. 5.6).
    e1 = {0: 3, 1: 5}
    e2 = {0: 5, 1: 4, 2: 3}
    e = Merge("p", "q", "c", Var("e1"), Var("e2"),
              Dict(Var("c"), Const(1)))
    assert canon(interp(e, {"e1": e1, "e2": e2})) == {3: 1, 5: 1}


def test_prim_even_odd_bits():
    assert interp(Prim("even_bits", (Const(0b1101),)), {}) == 0b11
    assert interp(Prim("odd_bits", (Const(0b1101),)), {}) == 0b10


def test_sr_add_dicts():
    assert sr_add({1: 2.0}, {1: 3.0, 2: 1.0}) == {1: 5.0, 2: 1.0}
    assert sr_add(0, {1: 1.0}) == {1: 1.0}
    assert sr_add({1: 1.0}, 0) == {1: 1.0}


def test_sr_mul_scalar_dict():
    assert sr_mul(2, {1: 3.0}) == {1: 6.0}
    assert sr_mul({1: 3.0}, 2) == {1: 6.0}
    assert sr_mul(0, {1: 3.0}) == 0


def test_sr_mul_dict_dict_intersects_keys():
    assert sr_mul({1: 2.0, 2: 5.0}, {1: 3.0, 3: 7.0}) == {1: 6.0}


def test_canon_drops_zero_entries():
    assert canon({1: 0.0, 2: {3: 0.0}, 4: 5.0}) == {4: 5.0}
    assert canon({1: 0.0}) == 0


def test_sum_over_numpy_array():
    a = np.array([1.0, 2.0, 3.0])
    e = Sum("i", "v", Var("a"), Var("v"))
    assert interp(e, {"a": a}) == 6.0
