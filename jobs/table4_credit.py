"""spark-submit entrypoint for T4 (Fig.6): credit-card regulation.

Usage: spark-submit jobs/table4_credit.py [--quick]
"""
from repro.tables.cli import main

if __name__ == "__main__":
    main("table4_credit", "T4 (Fig.6): credit-card regulation")
