"""The e-graph: hash-consed e-nodes, union-find, congruence rebuilding.

An *e-node* is ``(op, children)`` where ``op`` is a tuple encoding the
operator and its static payload (constants, variable names, binder names,
``@unique``/physical flags) and ``children`` are e-class ids. An *e-class*
is a set of e-nodes deemed equal.

Ops (payload layout):
    ("const", v)            ()                ("var", name)          ()
    ("add",) ("mul",) ("sub",) ("eq",) ("lt",) ("leq",)   (a, b)
    ("neg",)                (a,)
    ("dict", unique, phys)  (key, val)
    ("get",)                (dict, key)
    ("range",)              (lo, hi)
    ("subarr",)             (dict, lo, hi)
    ("if",)                 (cond, body)
    ("let", x)              (bound, body)     -- binds x in body
    ("sum", k, v)           (source, body)    -- binds k, v in body
    ("merge", k1, k2, v)    (s1, s2, body)    -- binds k1,k2,v in body
    ("prim", fn)            args

The e-graph carries a *free-variable analysis*: ``fv[class]`` is the
minimal achievable free-variable set of the class — the meet (set
intersection) over its e-nodes of each node's free variables. Rules with
"k, v not in FV(e)" side-conditions (Fig. 3 D2-D4, F1-F4) consult it.
This replaces the paper's De Bruijn indices (Sec. 5.4): binder names are
globally unique, so rules never need explicit substitution.
"""
from __future__ import annotations

from repro.sdqlite import ast as A

BINDERS = {"let": (1,), "sum": (1,), "merge": (2,)}
# op name -> indices of children in which the payload names are bound


def op_bound_names(op: tuple) -> tuple[str, ...]:
    """The names the operator binds (empty for non-binders)."""
    if op[0] in ("let", "sum", "merge"):
        return op[1:]
    return ()


def node_free_vars(op: tuple, child_fvs: list[frozenset]) -> frozenset:
    """Free variables of an e-node given its children's FV sets."""
    if op[0] == "var":
        return frozenset({op[1]})
    if op[0] == "const":
        return frozenset()
    kind = op[0]
    if kind == "let":
        return child_fvs[0] | (child_fvs[1] - {op[1]})
    if kind == "sum":
        return child_fvs[0] | (child_fvs[1] - {op[1], op[2]})
    if kind == "merge":
        return (
            child_fvs[0]
            | child_fvs[1]
            | (child_fvs[2] - {op[1], op[2], op[3]})
        )
    out: frozenset = frozenset()
    for f in child_fvs:
        out |= f
    return out


def node_depth(op: tuple, child_depths: list, var_depth: dict) -> int | None:
    """Dictionary-nesting depth of an e-node (0 = scalar), or None if
    unknown. Used by rules A2/A3, which are only sound when one factor is
    a scalar. ``var_depth`` maps variable names to depths (computed once
    from the typed naive plan)."""
    kind = op[0]
    if kind == "const":
        return 0
    if kind == "var":
        return var_depth.get(op[1])
    if kind in ("eq", "lt", "leq", "prim"):
        return 0
    if kind in ("add", "sub", "mul"):
        a, b = child_depths
        return max(a, b) if a is not None and b is not None else None
    if kind == "neg":
        return child_depths[0]
    if kind == "dict":
        d = child_depths[1]
        return d + 1 if d is not None else None
    if kind == "get":
        d = child_depths[0]
        return d - 1 if d is not None else None
    if kind == "range":
        return 1
    if kind == "subarr":
        return child_depths[0]
    if kind == "if":
        return child_depths[1]
    if kind in ("let", "sum"):
        return child_depths[1]
    if kind == "merge":
        return child_depths[2]
    return None


class EGraph:
    """Mutable e-graph with congruence closure, a free-variable analysis,
    and a dict-nesting-depth analysis."""

    def __init__(self, var_depth: dict | None = None) -> None:
        self.parent: list[int] = []  # union-find
        self.nodes: dict[int, set] = {}  # class id -> set of e-nodes
        self.memo: dict[tuple, int] = {}  # canonical e-node -> class id
        self.fv: dict[int, frozenset] = {}  # class id -> minimal FV set
        self.depth: dict[int, int | None] = {}  # class id -> dict depth
        self.var_depth: dict = var_depth or {}
        self.uses: dict[int, set] = {}  # class id -> e-nodes using it
        self.pending: list[int] = []  # worklist for rebuild
        self.memo_inserts = 0  # cumulative hashcons insertions ("Memos")
        self.version = 0  # bumped on every add/merge (change detection)

    # -- union-find -------------------------------------------------------
    def find(self, a: int) -> int:
        while self.parent[a] != a:
            self.parent[a] = self.parent[self.parent[a]]
            a = self.parent[a]
        return a

    def canonical(self, node: tuple) -> tuple:
        op, ch = node
        return (op, tuple(self.find(c) for c in ch))

    # -- construction -----------------------------------------------------
    def add(self, op: tuple, children: tuple[int, ...] = ()) -> int:
        node = (op, tuple(self.find(c) for c in children))
        if node in self.memo:
            return self.find(self.memo[node])
        cid = len(self.parent)
        self.parent.append(cid)
        self.nodes[cid] = {node}
        self.memo[node] = cid
        self.memo_inserts += 1
        self.version += 1
        for c in node[1]:
            self.uses.setdefault(c, set()).add(node)
        self.fv[cid] = node_free_vars(
            op, [self.fv[self.find(c)] for c in node[1]]
        )
        self.depth[cid] = node_depth(
            op, [self.depth[self.find(c)] for c in node[1]], self.var_depth
        )
        return cid

    def merge(self, a: int, b: int) -> int:
        a, b = self.find(a), self.find(b)
        if a == b:
            return a
        self.version += 1
        # union by size of node sets
        if len(self.nodes[a]) < len(self.nodes[b]):
            a, b = b, a
        self.parent[b] = a
        self.nodes[a] |= self.nodes.pop(b)
        self.uses.setdefault(a, set()).update(self.uses.pop(b, ()))
        new_fv = self.fv[a] & self.fv[b]
        fv_changed = new_fv != self.fv[a]
        self.fv[a] = new_fv
        del self.fv[b]
        # depth: refine unknown with known (equal members have equal depth)
        db = self.depth.pop(b, None)
        if self.depth.get(a) is None and db is not None:
            self.depth[a] = db
        self.pending.append(a)
        if fv_changed:
            self._propagate_fv(a)
        return a

    def _propagate_fv(self, cid: int) -> None:
        """Re-evaluate FV of classes whose nodes use ``cid`` (monotone
        decreasing, so this terminates)."""
        work = [cid]
        while work:
            c = self.find(work.pop())
            for node in list(self.uses.get(c, ())):
                owner = self.memo.get(self.canonical(node))
                if owner is None:
                    continue
                owner = self.find(owner)
                op, ch = node
                nf = node_free_vars(
                    op, [self.fv[self.find(x)] for x in ch]
                )
                # class fv is the meet over its nodes; a node's fv
                # shrinking can only shrink the class fv
                new = self.fv[owner] & nf
                if new != self.fv[owner]:
                    self.fv[owner] = new
                    work.append(owner)

    # -- congruence closure ----------------------------------------------
    def rebuild(self) -> None:
        """Restore the hashcons invariant after merges: nodes that become
        structurally identical (congruent) force their classes to merge."""
        while self.pending:
            todo = {self.find(c) for c in self.pending}
            self.pending.clear()
            for cid in todo:
                cid = self.find(cid)
                for node in list(self.uses.get(cid, ())):
                    canon = self.canonical(node)
                    if node in self.memo:
                        old = self.memo.pop(node)
                    else:
                        old = None
                    if canon in self.memo:
                        existing = self.find(self.memo[canon])
                        if old is not None:
                            self.merge(existing, old)
                    else:
                        if old is None:
                            continue
                        self.memo[canon] = self.find(old)
                        self.memo_inserts += 1
                        for c in canon[1]:
                            self.uses.setdefault(self.find(c), set()).add(canon)
        # re-canonicalize node sets
        for cid in list(self.nodes):
            if self.find(cid) != cid:
                continue
            self.nodes[cid] = {self.canonical(n) for n in self.nodes[cid]}

    # -- stats ------------------------------------------------------------
    def n_classes(self) -> int:
        return sum(1 for c in self.nodes if self.find(c) == c)

    def n_nodes(self) -> int:
        return sum(
            len(ns) for c, ns in self.nodes.items() if self.find(c) == c
        )

    def classes(self):
        """Iterate (canonical class id, set of canonical e-nodes)."""
        for cid, ns in list(self.nodes.items()):
            if self.find(cid) == cid:
                yield cid, ns

    def classes_by_op(self, opname: str):
        """Iterate (class id, e-node) pairs whose op[0] == opname."""
        for cid, ns in self.classes():
            for node in ns:
                if node[0][0] == opname:
                    yield cid, node


# ---------------------------------------------------------------------------
# Expr <-> e-graph conversion
# ---------------------------------------------------------------------------

def _expr_op(e: A.Expr) -> tuple:
    if isinstance(e, A.Const):
        return ("const", e.value)
    if isinstance(e, A.Var):
        return ("var", e.name)
    if isinstance(e, A.Add):
        return ("add",)
    if isinstance(e, A.Mul):
        return ("mul",)
    if isinstance(e, A.Sub):
        return ("sub",)
    if isinstance(e, A.Neg):
        return ("neg",)
    if isinstance(e, A.Eq):
        return ("eq",)
    if isinstance(e, A.Lt):
        return ("lt",)
    if isinstance(e, A.Leq):
        return ("leq",)
    if isinstance(e, A.Dict):
        return ("dict", e.unique, e.phys)
    if isinstance(e, A.Get):
        return ("get",)
    if isinstance(e, A.Range):
        return ("range",)
    if isinstance(e, A.SubArr):
        return ("subarr",)
    if isinstance(e, A.If):
        return ("if",)
    if isinstance(e, A.Let):
        return ("let", e.name)
    if isinstance(e, A.Sum):
        return ("sum", e.kname, e.vname)
    if isinstance(e, A.Merge):
        return ("merge", e.k1name, e.k2name, e.vname)
    if isinstance(e, A.Prim):
        return ("prim", e.fn)
    raise TypeError(f"not an Expr: {e!r}")


def expr_to_egraph(e: A.Expr, eg: EGraph) -> int:
    """Insert ``e`` into ``eg``; returns its e-class id."""
    kids = tuple(expr_to_egraph(c, eg) for c in A.children(e))
    return eg.add(_expr_op(e), kids)


def node_to_expr(op: tuple, child_exprs: tuple) -> A.Expr:
    """Rebuild an AST node from an e-node op and child ASTs."""
    kind = op[0]
    if kind == "const":
        return A.Const(op[1])
    if kind == "var":
        return A.Var(op[1])
    simple = {
        "add": A.Add, "mul": A.Mul, "sub": A.Sub, "eq": A.Eq,
        "lt": A.Lt, "leq": A.Leq, "get": A.Get, "range": A.Range,
        "if": A.If,
    }
    if kind in simple:
        return simple[kind](*child_exprs)
    if kind == "neg":
        return A.Neg(child_exprs[0])
    if kind == "dict":
        return A.Dict(child_exprs[0], child_exprs[1], op[1], op[2])
    if kind == "subarr":
        return A.SubArr(*child_exprs)
    if kind == "let":
        return A.Let(op[1], *child_exprs)
    if kind == "sum":
        return A.Sum(op[1], op[2], *child_exprs)
    if kind == "merge":
        return A.Merge(op[1], op[2], op[3], *child_exprs)
    if kind == "prim":
        return A.Prim(op[1], tuple(child_exprs))
    raise ValueError(f"unknown op {op!r}")


def extract_expr(eg: EGraph, root: int, choice: dict[int, tuple]) -> A.Expr:
    """Build the AST selected by ``choice`` (class id -> chosen e-node)."""
    memo: dict[int, A.Expr] = {}

    def go(cid: int) -> A.Expr:
        cid = eg.find(cid)
        if cid in memo:
            return memo[cid]
        op, ch = choice[cid]
        out = node_to_expr(op, tuple(go(c) for c in ch))
        memo[cid] = out
        return out

    return go(root)
