"""spark-submit entrypoint for T1 (Fig.1): single-operator scalability.

Usage: spark-submit jobs/table1_micro.py [--quick]
"""
from repro.tables.cli import main

if __name__ == "__main__":
    main("table1_micro", "T1 (Fig.1): single-operator scalability")
