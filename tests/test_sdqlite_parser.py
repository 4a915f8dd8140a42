"""Parser tests: the paper's example programs parse and evaluate correctly."""
import pytest

from repro.sdqlite.ast import (
    Add, Const, Dict, Eq, Get, If, Let, Mul, Range, Sub, SubArr, Sum, Var,
    free_vars,
)
from repro.sdqlite.interp import canon, interp
from repro.sdqlite.parser import parse


def test_parse_const():
    assert parse("42") == Const(42)
    assert parse("3.5") == Const(3.5)


def test_parse_global_var():
    assert parse("A") == Var("A")


def test_parse_arith_precedence():
    e = parse("1 + 2 * 3")
    assert interp(e, {}) == 7


def test_parse_range():
    assert interp(parse("0:3"), {}) == {0: 0, 1: 1, 2: 2}


def test_parse_subarray():
    got = interp(parse("A(1:3)"), {"A": {0: 5, 1: 6, 2: 7}})
    assert got == {1: 6, 2: 7}


def test_parse_curried_lookup():
    A = {1: {2: 9.0}}
    assert interp(parse("A(1,2)"), {"A": A}) == 9.0
    assert interp(parse("A(1)(2)"), {"A": A}) == 9.0


def test_parse_dict_tuple_key_curries():
    e = parse("{ (1,2) -> 5 }")
    assert interp(e, {}) == {1: {2: 5}}


def test_parse_dict_multi_entry():
    e = parse("{ 1 -> 10, 2 -> 20 }")
    assert canon(interp(e, {})) == {1: 10, 2: 20}


def test_parse_empty_dict_is_zero():
    assert interp(parse("{}"), {}) == 0


def test_parse_sum_simple():
    e = parse("sum(<i,v> in V) { i -> 5*v }")
    got = canon(interp(e, {"V": {0: 1.0, 3: 2.0}}))
    assert got == {0: 5.0, 3: 10.0}


def test_parse_sum_scalar_output():
    e = parse("sum(<i,v> in V) v")
    assert interp(e, {"V": {0: 1.0, 3: 2.0}}) == 3.0


def test_parse_repeated_key_becomes_equality():
    # Table 1 last row: <i,u> in U, <i,v> in V joins on i; the empty tuple
    # key { () -> e } is the scalar e (a 0-dim dict, Sec. 2).
    e = parse("sum(<i,u> in U, <i,v> in V) { () -> u*v }")
    got = interp(e, {"U": {0: 1.0, 1: 2.0}, "V": {0: 3.0, 1: 4.0, 5: 9.0}})
    assert got == 11.0


def test_parse_dot_product_scalar():
    e = parse("sum(<i,u> in U, <i,v> in V) u*v")
    got = interp(e, {"U": {0: 1.0, 1: 2.0}, "V": {0: 3.0, 1: 4.0, 5: 9.0}})
    assert got == 11.0


def test_parse_matmul_tuple_sugar():
    # Example 3.1: sum(<(i,j),a> in A, <(j,k),b> in B) {(i,k) -> a*b}
    A = {0: {0: 1.0, 1: 2.0}, 1: {0: 3.0, 1: 4.0}}
    B = {0: {0: 5.0, 1: 6.0}, 1: {0: 7.0, 1: 8.0}}
    e = parse("sum(<(i,j),a> in A, <(j,k),b> in B) { (i,k) -> a*b }")
    got = canon(interp(e, {"A": A, "B": B}))
    assert got == {0: {0: 19.0, 1: 22.0}, 1: {0: 43.0, 1: 50.0}}


def test_parse_matmul_dense_ranges():
    # Example 3.1 second form with explicit dimensions.
    A = {0: {0: 1.0, 1: 2.0}, 1: {0: 3.0, 1: 4.0}}
    B = {0: {0: 5.0, 1: 6.0}, 1: {0: 7.0, 1: 8.0}}
    src = """
      sum(<i,_> in 0:2, <j,_> in 0:2, <k,_> in 0:2)
        { (i,k) -> A(i,j)*B(j,k) }
    """
    got = canon(interp(parse(src), {"A": A, "B": B}))
    assert got == {0: {0: 19.0, 1: 22.0}, 1: {0: 43.0, 1: 50.0}}


def test_parse_let_multi_binding():
    e = parse("let a = 2, b = a * 3 in a + b")
    assert interp(e, {}) == 8


def test_parse_if_then():
    e = parse("sum(<i,v> in V) if (0 < v) then { i -> v }")
    got = canon(interp(e, {"V": {0: -1.0, 1: 2.0}}))
    assert got == {1: 2.0}


def test_parse_if_in_addition_binds_tight():
    # Band-matrix idiom: {..} + if (c) then {..}
    e = parse("{ 0 -> 1 } + if (1 < 2) then { 1 -> 5 }")
    assert canon(interp(e, {})) == {0: 1, 1: 5}


def test_parse_unique_annotation():
    e = parse("{ @unique 1 -> 2 }")
    assert isinstance(e, Dict) and e.unique


def test_parse_phys_annotation():
    assert parse("{ @dense 1 -> 2 }").phys == "dense"
    assert parse("{ @hash 1 -> 2 }").phys == "hash"


def test_parse_wildcard_binds_fresh():
    e = parse("sum(<i,_> in 0:3) { i -> i }")
    assert canon(interp(e, {})) == {1: 1, 2: 2}  # key 0 maps to 0, dropped


def test_fresh_names_are_globally_unique():
    e1 = parse("sum(<i,v> in V) v")
    e2 = parse("sum(<i,v> in V) v")
    assert isinstance(e1, Sum) and isinstance(e2, Sum)
    assert e1.kname != e2.kname and e1.vname != e2.vname


def test_scope_resolves_shadowing():
    e = parse("let x = 1 in let x = 2 in x")
    assert interp(e, {}) == 2


def test_parse_csr_storage_mapping():
    # Fig. 1(c): the CSR storage mapping, evaluated against Fig. 1(b) data.
    import numpy as np
    env = {
        "C_len1": 3,
        "C_pos2": np.array([0, 3, 3, 5]),
        "C_idx2": np.array([0, 2, 3, 0, 3]),
        "C_val": np.array([6.0, 9.0, 8.0, 5.0, 7.0]),
    }
    src = """
      sum(<row,_> in 0:C_len1)
        { @unique row ->
          sum(<off,col> in C_idx2( C_pos2(row):C_pos2(row+1) ))
            { @unique col -> C_val(off) } }
    """
    got = canon(interp(parse(src), env))
    assert got == {0: {0: 6.0, 2: 9.0, 3: 8.0}, 2: {0: 5.0, 3: 7.0}}


def test_parse_errors():
    with pytest.raises(SyntaxError):
        parse("sum(<i,v> in V")
    with pytest.raises(SyntaxError):
        parse("{ 1 -> }")
    with pytest.raises(SyntaxError):
        parse("1 $ 2")


def test_free_vars_of_parsed_sum():
    e = parse("sum(<i,v> in V) v * x")
    fv = free_vars(e)
    assert "V" in fv and "x" in fv
    assert not any(n.startswith("i%") or n.startswith("v%") for n in fv)
