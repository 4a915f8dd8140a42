"""Shared machinery for the Sec.-6 experiments: compile-and-time wrappers
for STOREL, the Taco simulation, and the fixed-primitive baselines.

Timing follows the paper's methodology (Sec. 6 setup): only execution time
is measured — storage construction, optimization, and compilation are
excluded (Fig. 10 measures optimization overhead separately).
"""
from __future__ import annotations

import time
from dataclasses import dataclass

import numpy as np

from repro.baselines import duckdb_rel, numpy_dense, scipy_like, torch_tf_sim
from repro.baselines.taco_sim import compile_taco
from repro.core.compile import Compiled, Limits, compile_kernel
from repro.core.kernels import KERNELS
from repro.exec.codegen import array_names, compile_plan, prepare_env
from repro.storage.coo import COO
from repro.storage.formats import store

DEFAULT_LIMITS = Limits(max_iters=8, max_nodes=12_000, timeout_s=8)


def median_time(fn, repeat: int = 3) -> float:
    """Median wall-clock seconds of ``fn()`` over ``repeat`` runs."""
    times = []
    for _ in range(repeat):
        t0 = time.perf_counter()
        fn()
        times.append(time.perf_counter() - t0)
    return sorted(times)[len(times) // 2]


@dataclass
class Prepared:
    """A compiled kernel ready to execute (data already laid out)."""

    compiled: Compiled
    runner: object  # () -> result
    compile_s: float


def prepare_storel(
    kname: str,
    coos: dict[str, COO],
    fmts: dict[str, str],
    scalars: dict[str, float] | None = None,
    *,
    families=None,
    exclude: tuple = (),
    limits: Limits | None = None,
    plan_attr: str = "plan",
) -> Prepared:
    """Compile ``kname`` with STOREL (or a rule-ablated variant) and return
    a zero-argument runner over the pre-laid-out physical data."""
    kernel = KERNELS[kname]
    stored = {n: store(n, coos[n], fmts[n]) for n, _ in kernel.tensors}
    t0 = time.perf_counter()
    c = compile_kernel(
        kernel, stored, scalar_env=scalars,
        families=families, exclude=exclude,
        limits=limits or DEFAULT_LIMITS,
    )
    plan = getattr(c, plan_attr)
    ck = compile_plan(plan, c.gdepth, array_names(c.env))
    compile_s = time.perf_counter() - t0
    env = prepare_env(c.env)
    return Prepared(c, lambda: ck(env), compile_s)


def prepare_taco(
    kname: str,
    coos: dict[str, COO],
    fmts: dict[str, str],
    scalars: dict[str, float] | None = None,
    limits: Limits | None = None,
) -> Prepared:
    kernel = KERNELS[kname]
    stored = {n: store(n, coos[n], fmts[n]) for n, _ in kernel.tensors}
    t0 = time.perf_counter()
    c = compile_taco(
        kernel, stored, scalar_env=scalars, limits=limits or DEFAULT_LIMITS
    )
    ck = compile_plan(c.plan, c.gdepth, array_names(c.env))
    compile_s = time.perf_counter() - t0
    env = prepare_env(c.env)
    return Prepared(c, lambda: ck(env), compile_s)


def baseline_runner(system: str, kname: str, coos: dict[str, COO],
                    scalars: dict[str, float] | None = None):
    """A zero-argument runner for a fixed-primitive baseline, or None if
    the system does not support the kernel (matches the paper's gaps)."""
    scalars = scalars or {}
    beta = scalars.get("beta", 1.0)
    if system == "duckdb":
        return lambda: duckdb_rel.run_duckdb(KERNELS[kname], coos, scalars)
    if kname in ("TTM", "MTTKRP"):
        return None  # Python frameworks lack sparse rank-3 (Sec. 6.1)
    A = coos.get("A")
    B = coos.get("B")
    x = coos["x"].to_dense() if "x" in coos else None
    table = {
        ("scipy", "MMM"): lambda: scipy_like.mmm(A, B),
        ("scipy", "SumMMM"): lambda: scipy_like.sum_mmm(A, B),
        ("scipy", "BATAX"): lambda: scipy_like.batax(beta, A, x),
        ("numpy", "MMM"): lambda: numpy_dense.mmm(A, B),
        ("numpy", "SumMMM"): lambda: numpy_dense.sum_mmm(A, B),
        ("numpy", "BATAX"): lambda: numpy_dense.batax(beta, A, x),
        ("torch_tf", "MMM"): lambda: torch_tf_sim.mmm(A, B),
        ("torch_tf", "SumMMM"): lambda: torch_tf_sim.sum_mmm(A, B),
        ("torch_tf", "BATAX"): lambda: torch_tf_sim.batax(beta, A, x),
    }
    return table.get((system, kname))


def print_table(title: str, rows: list[dict]) -> None:
    """Render rows as an aligned text table."""
    print(f"\n== {title} ==")
    if not rows:
        print("(no rows)")
        return
    cols = list(rows[0].keys())
    widths = {
        c: max(len(str(c)), *(len(str(r.get(c, ""))) for r in rows))
        for c in cols
    }
    print("  ".join(str(c).ljust(widths[c]) for c in cols))
    for r in rows:
        print("  ".join(str(r.get(c, "")).ljust(widths[c]) for c in cols))
