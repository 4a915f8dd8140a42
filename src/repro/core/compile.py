"""The STOREL compile pipeline (paper Sec. 5, Sec. 6.4).

Two optimization stages, exactly as the paper describes in Sec. 6.4 ("our
solution was to restrict the search space by splitting our optimization
pipeline into two stages"):

  1. *Storage-independent*: the tensor program alone is saturated with the
     44 logical rules and the cheapest logical plan is extracted.
  2. *Storage-aware*: the storage mappings are substituted for the tensor
     names (Sec. 5.1 composition), the result is saturated again with the
     full rule set (logical + the @dense/@hash physical rules), and the
     final physical plan is extracted with the Fig. 5/6 cost model.

Each stage produces one :class:`SaturationStats` — the two rows per kernel
of the paper's Table 4.
"""
from __future__ import annotations

import numpy as np
from dataclasses import dataclass, field

from repro.cost import cardinality as C
from repro.cost.model import Est, Stats, make_costfn, seed_var_estimates
from repro.egraph.egraph import EGraph, expr_to_egraph
from repro.egraph.extract import best_expr, extract
from repro.egraph.saturate import SaturationStats, saturate
from repro.rules.catalog import ALL_FAMILIES, LOGICAL_FAMILIES, rules
from repro.sdqlite import ast as A
from repro.sdqlite.ast import Expr, free_vars, subst_globals
from repro.sdqlite.parser import parse
from repro.sdqlite.types import infer_var_depths
from repro.storage.formats import StoredTensor


@dataclass
class Limits:
    """Saturation limits (Egg's stopping conditions)."""

    max_iters: int = 10
    max_nodes: int = 20_000
    timeout_s: float = 5.0

    def kw(self):
        return dict(
            max_iters=self.max_iters,
            max_nodes=self.max_nodes,
            timeout_s=self.timeout_s,
        )


@dataclass
class Compiled:
    """Result of compiling one kernel against one storage configuration."""

    kernel: str
    plan: Expr  # final physical plan (stage 2 extraction)
    tp_plan: Expr  # stage-1 optimized logical tensor program
    naive: Expr  # unoptimized composed plan (Fig. 9 baseline)
    composed: Expr | None = None  # stage-2 input: tp_plan with TSMs inlined
    stage_stats: list[SaturationStats] = field(default_factory=list)
    cost: float = 0.0
    env: dict = field(default_factory=dict)
    stats: Stats = field(default_factory=Stats)
    gdepth: dict = field(default_factory=dict)  # global name -> dict depth


def logical_est(st: StoredTensor) -> Est:
    """Cardinality estimate of a logical tensor from its COO statistics."""
    coo = st.coo
    kind = "hash" if st.fmt == "hash" else "dense"
    if coo.rank == 1:
        return Est(C.seq(coo.nnz), kind)
    if coo.rank == 2:
        r = max(1, len(np.unique(coo.coords[:, 0])))
        return Est(C.seq(r, C.seq(coo.nnz / r)), kind)
    iu = max(1, len(np.unique(coo.coords[:, 0])))
    ij = max(
        1,
        len(np.unique(coo.coords[:, 0] * (coo.shape[1] + 1) + coo.coords[:, 1])),
    )
    return Est(C.seq(iu, C.seq(ij / iu, C.seq(coo.nnz / ij))), kind)


def _compose(e: Expr, stored: dict[str, StoredTensor]) -> Expr:
    """Sec. 5.1 composition, one fresh TSM parse per tensor occurrence."""
    if isinstance(e, A.Var) and e.name in stored:
        return parse(stored[e.name].tsm_src)
    kids = tuple(_compose(c, stored) for c in A.children(e))
    return A.rebuild(e, kids)


def _count_var(e: Expr, name: str) -> int:
    if isinstance(e, A.Var):
        return 1 if e.name == name else 0
    return sum(_count_var(c, name) for c in A.children(e))


def inline_lets(e: Expr) -> Expr:
    """Inline ``let x = e1 in body`` when x is used at most once or e1 is
    trivial (a variable or constant). Plain AST substitution — sound
    because binder names are globally unique (no capture). This is the
    substitution step Egg cannot perform inside the e-graph (Sec. 5.4);
    interleaving it with saturation unlocks fusion *through* the lets that
    rules F1-F3 introduce."""
    kids = tuple(inline_lets(c) for c in A.children(e))
    e = A.rebuild(e, kids)
    if isinstance(e, A.Let):
        uses = _count_var(e.body, e.name)
        if uses == 0:
            return e.body
        if uses == 1 or isinstance(e.bound, (A.Var, A.Const)):
            return subst_globals(e.body, {e.name: e.bound})
    return e


def strip_trivial_lets(e: Expr) -> Expr:
    """Inline only Var/Const-bound lets (incl. degenerate ``let x = x``)
    left behind by fusion rules — a final-plan cleanup that can never
    change how often anything is computed."""
    kids = tuple(strip_trivial_lets(c) for c in A.children(e))
    e = A.rebuild(e, kids)
    if isinstance(e, A.Let) and isinstance(e.bound, (A.Var, A.Const)):
        return subst_globals(e.body, {e.name: e.bound})
    return e


def _optimize(
    expr: Expr,
    stats: Stats,
    gdepth: dict,
    rule_list,
    limits: Limits,
    rounds: int = 3,
    fuse: bool = True,
):
    """Iterated saturation: (AST-level fusion), saturate + extract, inline
    single-use lets, repeat until the plan stops changing (or ``rounds``
    is hit). The AST-level fusion pass (repro.core.fuse) performs the
    substitution-based deep fusion that cannot live inside the e-graph
    (Sec. 5.4). Returns (plan, cost, [stats per round])."""
    from repro.core.fuse import fuse_pass

    cur = fuse_pass(expr) if fuse else expr
    sats: list[SaturationStats] = []
    plan, cost = cur, float("inf")
    for _ in range(max(rounds, 1)):
        seed_var_estimates(cur, stats)
        eg = EGraph(var_depth=infer_var_depths(cur, gdepth))
        root = expr_to_egraph(cur, eg)
        sats.append(saturate(eg, rule_list, **limits.kw()))
        best = extract(eg, root, make_costfn(stats))
        choice = best[eg.find(root)]
        plan, cost = best_expr(eg, root, best), choice.cost
        nxt = inline_lets(plan)
        if fuse:
            nxt = fuse_pass(nxt)
        if nxt == cur:
            break
        cur = nxt
    return strip_trivial_lets(plan), cost, sats


def _merge_stats(sats: list[SaturationStats]) -> SaturationStats:
    """Collapse per-round stats into one Table-4 row: times and iterations
    accumulate; nodes/classes/memos report the largest e-graph built."""
    return SaturationStats(
        time_ms=sum(s.time_ms for s in sats),
        iterations=sum(s.iterations for s in sats),
        nodes=max(s.nodes for s in sats),
        classes=max(s.classes for s in sats),
        memos=max(s.memos for s in sats),
        saturated=sats[-1].saturated,
    )


def compile_kernel(
    kernel,
    stored: dict[str, StoredTensor],
    *,
    scalar_env: dict | None = None,
    families=None,
    exclude: tuple = (),
    limits: Limits | None = None,
) -> Compiled:
    """Compile ``kernel`` (a :class:`repro.core.kernels.Kernel`) for the
    given per-tensor storage. ``scalar_env`` supplies scalar parameters
    (e.g. ``beta``). ``families`` restricts the logical rule families and
    ``exclude`` drops individual rules by name (Fig. 9 ablations)."""
    limits = limits or Limits()
    scalar_env = dict(scalar_env or {})
    fams = list(families) if families is not None else list(LOGICAL_FAMILIES)

    tp = parse(kernel.tp_src)

    # ---- stage 1: storage-independent --------------------------------
    stats1 = Stats()
    for name, st in stored.items():
        stats1.var_est[name] = logical_est(st)
    for s in scalar_env:
        stats1.var_est[s] = Est(C.S)
    gdepth1 = {
        **{n: st.coo.rank for n, st in stored.items()},
        **{s: 0 for s in scalar_env},
    }
    fuse = "fusion" in fams
    tp_plan, _, sats1 = _optimize(
        tp, stats1, gdepth1, rules(fams, exclude), limits, fuse=fuse
    )

    # ---- stage 2: storage-aware --------------------------------------
    # Each OCCURRENCE of a tensor gets a freshly-parsed storage mapping so
    # binder names stay globally unique even when a tensor is referenced
    # twice (BATAX's A) — substitution-based rules rely on this.
    composed = _compose(tp_plan, stored)
    naive = _compose(tp, stored)

    stats2 = Stats()
    env: dict = dict(scalar_env)
    gdepth: dict = {s: 0 for s in scalar_env}
    for st in stored.values():
        stats2.var_est.update(st.var_est)
        env.update(st.env)
        gdepth.update(st.depths)
    for s in scalar_env:
        stats2.var_est[s] = Est(C.S)

    plan, cost, sats2 = _optimize(
        composed, stats2, gdepth, rules(fams + ["phys"], exclude), limits,
        fuse=fuse,
    )

    leaked = free_vars(plan) - set(env)
    if leaked:
        raise RuntimeError(f"optimized plan leaks variables: {leaked}")

    return Compiled(
        kernel=kernel.name,
        plan=plan,
        tp_plan=tp_plan,
        naive=naive,
        composed=composed,
        stage_stats=[_merge_stats(sats1), _merge_stats(sats2)],
        cost=cost,
        env=env,
        stats=stats2,
        gdepth=gdepth,
    )
