"""Reproduce Table 4 (reconfiguration delays in W2/W3, Fries vs Epoch).

Usage: spark-submit jobs/run_table4.py [--profile] [--sf 0.02]

With ``--profile`` the W2/W3 Spark pipelines are first profiled over
``synth_data.tpcds_lite`` at the given scale factor and the measured join
selectivities are fed into the engine simulator; otherwise the recorded
defaults in ``repro.workflows.defs`` (measured the same way) are used.
"""
import argparse

from repro.experiments import format_table, table4_rows


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--profile", action="store_true")
    ap.add_argument("--sf", type=float, default=0.02)
    ap.add_argument("--parallelism", type=int, default=4)
    ap.add_argument("--rate", type=float, default=8000.0)
    args = ap.parse_args()

    if args.profile:
        from _session import get_spark

        from repro import synth_data
        from repro.workflows import defs
        from repro.workflows.profiles import profile_w2, profile_w3

        spark = get_spark("fries-table4-profile")
        tables = synth_data.tpcds_lite(spark, sf=args.sf)
        p2, p3 = profile_w2(tables), profile_w3(tables)
        defs.W2_SELECTIVITY.update({k: min(v, 1.0) for k, v in p2.selectivity.items()})
        defs.W3_SELECTIVITY.update({k: min(v, 1.0) for k, v in p3.selectivity.items()})
        print("profiled W2 selectivities:", {k: round(v, 3) for k, v in p2.selectivity.items()})
        print("profiled W3 selectivities:", {k: round(v, 3) for k, v in p3.selectivity.items()})
        spark.stop()

    rows = table4_rows(parallelism=args.parallelism, rate=args.rate)
    print(format_table(rows, "Table 4 — reconfiguration delay in W2/W3 (ms, simulated)"))


if __name__ == "__main__":
    main()
