"""Experiment harnesses, one module per paper table/figure (Sec. 6).

Each module exposes ``rows(...) -> list[dict]`` (the numbers) and
``main()`` (pretty-print, used by the jobs/ entrypoints). Benchmarks in
benchmarks/ time the same code under pytest-benchmark.
"""
