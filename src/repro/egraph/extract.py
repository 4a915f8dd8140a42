"""Cost-based extraction from the e-graph (paper Sec. 5.6-5.7).

``extract(eg, root, costfn)`` runs a bottom-up fixpoint that picks, for
every e-class, the e-node minimizing ``costfn``. Unlike Egg — whose cost
can only be a single number, a limitation the paper works around with
"hacks" (Sec. 6.6) — ``costfn`` here returns ``(cost, data)`` where
``data`` is arbitrary (we thread the Fig. 5 cardinality structure through
it).

Scope safety: because guarded rules may place a class outside the binder
that some of its members reference, a chosen e-node whose free variables
exceed the class's minimal achievable FV set is penalized by ``UNBOUND``,
steering extraction to representatives that keep the final plan closed.
"""
from __future__ import annotations

import math
from dataclasses import dataclass

from repro.egraph.egraph import node_free_vars

UNBOUND = 1e30  # penalty for choices that would leak a bound variable


@dataclass
class Choice:
    """The selected e-node for one e-class."""

    cost: float
    node: tuple
    fv: frozenset
    data: object  # costfn payload (e.g. estimated cardinality)


def extract(eg, root: int, costfn) -> dict[int, Choice]:
    """Compute the best choice per e-class reachable from ``root``.

    ``costfn(op, child_choices) -> (cost, data)`` where ``child_choices``
    is the list of :class:`Choice` for the node's children.
    Returns the full choice map; use :func:`best_expr` to materialize the
    AST. Raises if the root class has no finite-cost representative.
    """
    best: dict[int, Choice] = {}
    changed = True
    while changed:
        changed = False
        for cid, nodes in eg.classes():
            for node in nodes:
                op, ch = node
                kids = []
                ok = True
                for c in ch:
                    cc = eg.find(c)
                    if cc not in best:
                        ok = False
                        break
                    kids.append(best[cc])
                if not ok:
                    continue
                cost, data = costfn(op, kids, node)
                fv = node_free_vars(op, [k.fv for k in kids])
                if not fv <= eg.fv[cid]:
                    cost = cost + UNBOUND
                cur = best.get(cid)
                if cur is None or cost < cur.cost:
                    best[cid] = Choice(cost, node, fv, data)
                    changed = True
    if eg.find(root) not in best:
        raise ValueError("no extractable representative for the root class")
    return best


def best_expr(eg, root: int, best: dict[int, Choice]):
    """Materialize the AST selected by ``best`` starting at ``root``."""
    from repro.egraph.egraph import node_to_expr

    memo: dict[int, object] = {}

    def go(cid: int):
        cid = eg.find(cid)
        if cid in memo:
            return memo[cid]
        op, ch = best[cid].node
        out = node_to_expr(op, tuple(go(c) for c in ch))
        memo[cid] = out
        return out

    return go(eg.find(root))


def size_costfn(op: tuple, kids: list[Choice], node=None):
    """Trivial cost: AST size (used by tests and random-plan sampling)."""
    return 1.0 + sum(k.cost for k in kids), None


def random_costfn(rng):
    """A randomized cost function: used to sample *arbitrary* equivalent
    plans from a saturated e-graph for semantics-preservation testing.
    Per-node weights are cached so the extraction fixpoint terminates."""
    cache: dict[tuple, float] = {}

    def f(op: tuple, kids: list[Choice], node):
        w = cache.setdefault(node, rng.random() + 1e-3)
        return w + sum(k.cost for k in kids), None

    return f
