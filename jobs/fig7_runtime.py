"""Regenerate Fig. 7 (as a table): end-to-end kernel runtimes over the
Table-2 dataset analogs for STOREL and all comparator systems.

Usage: python jobs/fig7_runtime.py [scale]
"""
import sys

from repro.experiments import fig7

if __name__ == "__main__":
    scale = float(sys.argv[1]) if len(sys.argv) > 1 else 1 / 20
    fig7.main(scale)
