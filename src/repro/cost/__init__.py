"""Cardinality estimation (Fig. 5) and the cost model (Fig. 6)."""
from repro.cost.cardinality import Card, S, seq  # noqa: F401
from repro.cost.model import Est, Gammas, Stats, make_costfn  # noqa: F401
