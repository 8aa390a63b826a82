"""Demonstrate reconfiguration consistency on real Spark execution:
replay naive-FCM / Fries / epoch swap schedules over the W4 pipeline and
count mixed-version transactions (§4.2's observable anomaly).

Usage: spark-submit jobs/run_consistency.py [--sf 0.0005]
"""
import argparse

from _session import get_spark
from pyspark.sql import functions as F

from repro import synth_data
from repro.streaming import (
    count_mixed,
    epoch_schedule,
    fries_schedule,
    naive_schedule,
    w4_with_swap,
)


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--sf", type=float, default=0.0005)
    args = ap.parse_args()
    spark = get_spark("fries-consistency")
    by_user = synth_data.payments_by_user(spark, sf=args.sf).cache()
    total = by_user.select(F.sum(F.size("pays"))).first()[0]
    med = int(by_user.select(F.expr("percentile(pays[0].seq, 0.5)")).first()[0])

    for name, sched in (
        ("naive FCM", naive_schedule(total // 2, total // 3)),
        ("Fries", fries_schedule(med)),
        ("epoch", epoch_schedule(med)),
    ):
        out = w4_with_swap(by_user, sched, min_payments=2)
        mixed = count_mixed(out, ["v_FD1", "v_FD2"])
        n_txn = out.select("txn").distinct().count()
        print(f"{name:10s}: {mixed:6d} / {n_txn} transactions observed both "
              f"configurations ({'INCONSISTENT' if mixed else 'consistent'})")
    spark.stop()


if __name__ == "__main__":
    main()
