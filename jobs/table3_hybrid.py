"""spark-submit entrypoint for T3 (Fig.5): hybrid operator microbenchmarks.

Usage: spark-submit jobs/table3_hybrid.py [--quick]
"""
from repro.tables.cli import main

if __name__ == "__main__":
    main("table3_hybrid", "T3 (Fig.5): hybrid operator microbenchmarks")
