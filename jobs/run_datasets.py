"""Regenerate the Table 3 dataset inventory for the synthetic substitutes.

Usage: spark-submit jobs/run_datasets.py [--sf-ds 0.01] [--sf-pay 0.001]
"""
import argparse

from _session import get_spark

from repro import synth_data


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--sf-ds", type=float, default=0.01)
    ap.add_argument("--sf-pay", type=float, default=0.001)
    args = ap.parse_args()
    spark = get_spark("fries-datasets")

    print("Table 3 (synthetic substitutes) — dataset | table | attrs | tuples")
    pay = synth_data.payments(spark, sf=args.sf_pay)
    print(f"1 | credit card payment | {len(pay.columns)} | {pay.count():,} "
          f"(paper: 12 attrs, 24M)")
    bu = synth_data.payments_by_user(spark, sf=args.sf_pay)
    print(f"2 | payments per user | {len(bu.columns)} | {bu.count():,} "
          f"(paper: 2 attrs, 20K)")
    t = synth_data.tpcds_lite(spark, sf=args.sf_ds)
    for name, paper in (("catalog_sales", "34 attrs, 144M"),
                        ("store_sales", "23 attrs, 288M"),
                        ("web_sales", "34 attrs, 71M")):
        df = t[name]
        print(f"3 | {name} | {len(df.columns)} | {df.count():,} (paper: {paper})")
    spark.stop()


if __name__ == "__main__":
    main()
