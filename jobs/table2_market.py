"""spark-submit entrypoint for T2 (Fig.4): market concentration (HHI).

Usage: spark-submit jobs/table2_market.py [--quick]
"""
from repro.tables.cli import main

if __name__ == "__main__":
    main("table2_market", "T2 (Fig.4): market concentration (HHI)")
