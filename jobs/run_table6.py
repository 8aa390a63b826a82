"""Reproduce Table 6 (effect of MCS pruning on delay in W5).

Usage: spark-submit jobs/run_table6.py
"""
from repro.experiments import format_table, table6_rows


def main() -> None:
    rows = table6_rows()
    print(format_table(rows, "Table 6 — effect of MCS pruning in W5 (ms, simulated)"))


if __name__ == "__main__":
    main()
