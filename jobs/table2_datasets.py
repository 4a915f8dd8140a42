"""Regenerate Table 2: the evaluation datasets (synthetic analogs).

Usage: python jobs/table2_datasets.py [scale]
"""
import sys

from repro.experiments import table2

if __name__ == "__main__":
    scale = float(sys.argv[1]) if len(sys.argv) > 1 else 1 / 20
    table2.main(scale)
