"""spark-submit entrypoint for T6 (Fig.7b): comorbidity, Conclave vs SMCQL.

Usage: spark-submit jobs/table6_comorbidity.py [--quick]
"""
from repro.tables.cli import main

if __name__ == "__main__":
    main("table6_comorbidity", "T6 (Fig.7b): comorbidity, Conclave vs SMCQL")
