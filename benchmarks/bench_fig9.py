"""Benchmark: Fig. 9 — BATAX rule-family ablation at density 2^-5,
A is 1000 x 1000 (the paper's setting)."""
import pytest

from repro.experiments.fig9 import VARIANTS
from repro.experiments.runners import prepare_storel
from repro.storage.coo import random_sparse
from repro.synth_tensors import sf_vector

N, D = 1000, 2 ** -5


@pytest.fixture(scope="module")
def coos():
    return {"A": random_sparse((N, N), D, seed=1), "x": sf_vector(N, seed=2)}


@pytest.mark.parametrize("label,fmt,fams,excl,attr", VARIANTS,
                         ids=[v[0] for v in VARIANTS])
def test_variant(benchmark, coos, label, fmt, fams, excl, attr):
    p = prepare_storel(
        "BATAX", coos, {"A": fmt, "x": "dense"}, {"beta": 2.0},
        families=fams, exclude=excl, plan_attr=attr,
    )
    # the unoptimized baseline runs for ~25 s; cap the rounds
    benchmark.pedantic(p.runner, rounds=3, iterations=1, warmup_rounds=0)
