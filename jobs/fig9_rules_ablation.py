"""Regenerate Fig. 9 (as a table): impact of the factorization and fusion
rule families on the BATAX kernel.

Usage: python jobs/fig9_rules_ablation.py [n]
"""
import sys

from repro.experiments import fig9

if __name__ == "__main__":
    n = int(sys.argv[1]) if len(sys.argv) > 1 else 1000
    fig9.main(n)
