"""spark-submit entrypoint for T5 (Fig.7a): aspirin count, Conclave vs SMCQL.

Usage: spark-submit jobs/table5_aspirin.py [--quick]
"""
from repro.tables.cli import main

if __name__ == "__main__":
    main("table5_aspirin", "T5 (Fig.7a): aspirin count, Conclave vs SMCQL")
