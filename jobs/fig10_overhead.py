"""Regenerate Fig. 10 (as a table): total time (optimization + execution)
of BATAX vs matrix width N, for the unoptimized / stage-1-only / fully
optimized versions.

Usage: python jobs/fig10_overhead.py
"""
from repro.experiments import fig10

if __name__ == "__main__":
    fig10.main()
