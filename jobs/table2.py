"""Regenerate Table II (index statistics) — paper vs measured.

Usage: spark-submit jobs/table2.py [--sf 1.0] [--datasets ...] [--local]
``--local`` skips Spark and builds the k-span tables driver-side only.
"""
import argparse

import pandas as pd

from repro.tables.table2 import PAPER_TABLE2, table2


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--sf", type=float, default=1.0)
    ap.add_argument("--seed", type=int, default=7)
    ap.add_argument("--datasets", type=str, default="")
    ap.add_argument("--local", action="store_true")
    args = ap.parse_args()
    names = [d for d in args.datasets.split(",") if d] or None
    spark = None
    if not args.local:
        from repro.sparkutil import get_session

        spark = get_session("table2")
    df = table2(sf=args.sf, seed=args.seed, datasets=names, spark=spark)
    print("== Table II (measured) ==")
    print(df.to_string(index=False, float_format=lambda x: f"{x:.6g}"))
    paper = pd.DataFrame([{"dataset": k, **v} for k, v in PAPER_TABLE2.items()])
    print("\n== Table II (paper) ==")
    print(paper.to_string(index=False, float_format=lambda x: f"{x:.6g}"))
    if spark is not None:
        spark.stop()


if __name__ == "__main__":
    main()
