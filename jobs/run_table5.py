"""Reproduce Table 5 (delays in W4 with the one-to-many unnest U2).

Usage: spark-submit jobs/run_table5.py [--sf 0.001]

The W4 Spark pipeline over ``synth_data.payments_by_user`` provides the
unnest fan-out distribution; its mean parameterises the simulator.
"""
import argparse

from repro.experiments import format_table, table5_rows


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--sf", type=float, default=0.0)
    ap.add_argument("--parallelism", type=int, default=4)
    args = ap.parse_args()

    fanout = 12
    if args.sf > 0:
        from _session import get_spark
        from pyspark.sql import functions as F

        from repro import synth_data

        spark = get_spark("fries-table5-profile")
        bu = synth_data.payments_by_user(spark, sf=args.sf)
        fanout = max(2, int(bu.select(F.avg(F.size("pays"))).first()[0]))
        print(f"profiled unnest fanout: {fanout}")
        spark.stop()

    rows = table5_rows(parallelism=args.parallelism, fanout=fanout)
    print(format_table(rows, "Table 5 — delays in W4 with one-to-many U2 (ms, simulated)"))


if __name__ == "__main__":
    main()
