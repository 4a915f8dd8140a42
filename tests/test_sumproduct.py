"""Unit tests for the sum-product recognizer (core.sumproduct)."""
import pytest

from repro.core.sumproduct import SP, Unsupported, to_sumproduct
from repro.sdqlite.parser import parse


def test_simple_join_aggregate():
    sp = to_sumproduct(
        parse("sum(<(i,j),a> in A, <(j,k),b> in B) { (i,k) -> a*b }"),
        {"A": 2, "B": 2},
    )
    assert len(sp.atoms) == 2
    a, b = sp.atoms
    assert a.tensor == "A" and b.tensor == "B"
    assert a.keys[1] == b.keys[0]  # join variable unified
    assert len(sp.out_keys) == 2
    assert {f[0] for f in sp.factors} == {"val"}


def test_scalar_aggregate_no_out_keys():
    sp = to_sumproduct(
        parse("sum(<(i,j),a> in A, <(j,k),b> in B) a*b"),
        {"A": 2, "B": 2},
    )
    assert sp.out_keys == []


def test_lookup_becomes_atom():
    sp = to_sumproduct(
        parse("sum(<i,v> in y) v * x(i)"), {"y": 1, "x": 1}
    )
    assert {a.tensor for a in sp.atoms} == {"x", "y"}
    xa = [a for a in sp.atoms if a.tensor == "x"][0]
    ya = [a for a in sp.atoms if a.tensor == "y"][0]
    assert xa.keys == ya.keys  # lookup key joins with the loop key


def test_scalar_parameter_factor():
    sp = to_sumproduct(parse("sum(<i,v> in y) beta * v"),
                       {"y": 1}, {"beta"})
    assert ("scalar", "beta") in sp.factors


def test_top_level_scalar_times_aggregate():
    sp = to_sumproduct(
        parse("(sum(<(i,j),a> in A) { j -> a }) * beta"),
        {"A": 2}, {"beta"},
    )
    assert ("scalar", "beta") in sp.factors
    assert len(sp.out_keys) == 1


def test_dict_valued_rowvar_factor():
    # factorized-BATAX shape: row dict times a scalar sub-aggregate
    sp = to_sumproduct(
        parse("sum(<i,w> in A) w * (sum(<k,u> in x) u)"),
        {"A": 2, "x": 1},
    )
    assert sp.out_keys  # completion key of the residual row iteration
    assert len(sp.subs) == 1
    assert sp.subs[0].keys == []  # uncorrelated sub-aggregate


def test_correlated_subaggregate_groups_by_outer_var():
    src = """
      sum(<(i,j),a> in A)
        a * (sum(<j2,w> in B) if (j2 == j) then sum(<k,b> in w) b)
    """
    sp = to_sumproduct(parse(src), {"A": 2, "B": 2})
    assert len(sp.subs) == 1
    assert len(sp.subs[0].keys) == 1  # grouped by the shared j


def test_partial_lookup_shape():
    src = "sum(<(i,j),a> in A) { i -> a * (sum(<j2,w> in B) if (j2 == j) then w) }"
    sp = to_sumproduct(parse(src), {"A": 2, "B": 2})
    bs = [a for a in sp.atoms if a.tensor == "B"]
    assert bs and len(bs[0].keys) == 2  # completed to full rank
    assert len(sp.out_keys) == 2  # i plus the completion key


def test_unsupported_guard_raises():
    with pytest.raises(Unsupported):
        to_sumproduct(
            parse("sum(<i,v> in y) if (i < 3) then v"), {"y": 1}
        )


def test_diagonal_duplicate_key():
    sp = to_sumproduct(
        parse("sum(<(i,i2),a> in A) if (i == i2) then a"), {"A": 2}
    )
    [atom] = sp.atoms
    assert atom.keys[0] == atom.keys[1]
