"""Regenerate Fig. 8 (as a table): runtime vs density, sparse and dense
storage formats, for MMM / ΣMMM / BATAX.

Usage: python jobs/fig8_sparsity.py [n]
"""
import sys

from repro.experiments import fig8

if __name__ == "__main__":
    n = int(sys.argv[1]) if len(sys.argv) > 1 else 250
    fig8.main(n)
