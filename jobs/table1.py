"""Regenerate Table I (dataset statistics) — paper vs measured.

Usage: spark-submit jobs/table1.py [--sf 1.0] [--datasets email,youtube]
"""
import argparse

from repro.sparkutil import get_session
from repro.tables.table1 import format_table, table1, table1_with_paper


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--sf", type=float, default=1.0)
    ap.add_argument("--seed", type=int, default=7)
    ap.add_argument("--datasets", type=str, default="")
    args = ap.parse_args()
    names = [d for d in args.datasets.split(",") if d] or None
    spark = get_session("table1")
    df = table1(spark, sf=args.sf, seed=args.seed, datasets=names)
    print("== Table I (measured, synthetic analogs) ==")
    print(format_table(df))
    print("\n== side-by-side with the paper ==")
    print(format_table(table1_with_paper(df)))
    spark.stop()


if __name__ == "__main__":
    main()
