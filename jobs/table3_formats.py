"""Regenerate Table 3: best storage format per (kernel, system), found by
sweeping candidate formats and timing each.

Usage: python jobs/table3_formats.py [n]
"""
import sys

from repro.experiments import table3

if __name__ == "__main__":
    n = int(sys.argv[1]) if len(sys.argv) > 1 else 600
    table3.main(n)
