"""The rewrite-rule knowledge base (paper Fig. 3 + Sec. 5.6)."""
from repro.rules.catalog import (  # noqa: F401
    ALL_FAMILIES, logical_rules, physical_rules, rules,
)
