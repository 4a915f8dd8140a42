"""Equality saturation driver (paper Sec. 5.3).

Repeatedly e-matches every rule against the whole e-graph and applies all
matches, then rebuilds congruence, until either the e-graph stops changing
(saturation) or a limit is hit (iterations, node count, wall-clock) — the
same stopping conditions Egg uses. Collects the metrics the paper reports
in Table 4: time, iterations, nodes, classes, memos.
"""
from __future__ import annotations

import time
from dataclasses import dataclass


@dataclass
class SaturationStats:
    """Table-4 row: one saturation run."""

    time_ms: float
    iterations: int
    nodes: int
    classes: int
    memos: int
    saturated: bool

    def row(self) -> tuple:
        return (
            round(self.time_ms),
            self.iterations,
            self.nodes,
            self.classes,
            self.memos,
        )


def saturate(
    eg,
    rules,
    *,
    max_iters: int = 30,
    max_nodes: int = 50_000,
    timeout_s: float = 10.0,
) -> SaturationStats:
    """Run equality saturation on ``eg`` with ``rules``."""
    t0 = time.perf_counter()
    saturated = False
    iters = 0
    for _ in range(max_iters):
        iters += 1
        matches = []
        for rule in rules:
            matches.extend((rule, cid, s) for cid, s in rule.search(eg))
        changed = False
        for rule, cid, s in matches:
            if rule.apply(cid, s, eg):
                changed = True
        eg.rebuild()
        if not changed:
            saturated = True
            break
        if eg.n_nodes() > max_nodes:
            break
        if time.perf_counter() - t0 > timeout_s:
            break
    return SaturationStats(
        time_ms=(time.perf_counter() - t0) * 1e3,
        iterations=iters,
        nodes=eg.n_nodes(),
        classes=eg.n_classes(),
        memos=eg.memo_inserts,
        saturated=saturated,
    )
