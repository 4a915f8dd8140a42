"""Benchmark: Fig. 10 — end-to-end (optimize + execute) vs execute-naive,
BATAX with A of width N = 10000: the optimization overhead must be
amortized at this size (the paper's crossover argument)."""
import pytest

from repro.experiments.fig10 import _variants

N = 3000  # the naive plan is O(sum of row-nnz^2); keep rounds tractable


@pytest.fixture(scope="module")
def variants():
    return {label: (opt_s, runner)
            for label, opt_s, runner in _variants(N)}


def test_unoptimized_run(benchmark, variants):
    _, runner = variants["unoptimized"]
    benchmark(runner)


def test_full_run(benchmark, variants):
    _, runner = variants["full"]
    benchmark(runner)
