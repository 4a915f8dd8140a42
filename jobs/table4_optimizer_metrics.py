"""Regenerate Table 4: rewrite-engine compilation metrics (time,
iterations, e-nodes, e-classes, memos) for both optimization stages.

Usage: python jobs/table4_optimizer_metrics.py [n]
"""
import sys

from repro.experiments import table4

if __name__ == "__main__":
    n = int(sys.argv[1]) if len(sys.argv) > 1 else 200
    table4.main(n)
