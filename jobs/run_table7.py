"""Reproduce Table 7 (worker-level data-channel counts for W2 {J1, J4}).

Usage: spark-submit jobs/run_table7.py
"""
from repro.experiments import format_table, table7_rows


def main() -> None:
    rows = table7_rows()
    print(format_table(rows, "Table 7 — data channels, all workers vs MCS workers"))
    exact = all(
        r["channels_all"] == r["paper_channels_all"]
        and r["channels_mcs"] == r["paper_channels_mcs"]
        for r in rows
    )
    print(f"exact match with paper: {exact}")


if __name__ == "__main__":
    main()
