"""A from-scratch equality-saturation engine (the paper's Egg substitute).

The paper (Sec. 5.3) uses Egg [54]; this package reimplements the same
machinery in Python: hash-consed e-nodes, a union-find over e-classes,
congruence-closure rebuilding, e-matching of patterns, saturation with
iteration/node limits, a free-variable e-class analysis (our substitute for
De Bruijn indices, Sec. 5.4), and cost-based extraction (Sec. 5.6-5.7).
It reports the same metrics as the paper's Table 4: time, iterations,
nodes, classes, memos.
"""
from repro.egraph.egraph import EGraph, expr_to_egraph, extract_expr  # noqa: F401
from repro.egraph.pattern import P, PVar, Rule  # noqa: F401
from repro.egraph.saturate import SaturationStats, saturate  # noqa: F401
