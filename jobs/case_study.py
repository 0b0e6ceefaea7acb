"""Regenerate the Fig. 2 case-study table (Email analog) — paper vs measured.

Usage: python jobs/case_study.py [--sf 1.0] [--k K]
"""
import argparse

from repro.tables.case_study import PAPER_CASE_STUDY, case_study


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--sf", type=float, default=1.0)
    ap.add_argument("--seed", type=int, default=7)
    ap.add_argument("--k", type=int, default=None)
    args = ap.parse_args()
    df = case_study(sf=args.sf, seed=args.seed, k=args.k)
    print("== Fig. 2 case-study table (measured, Email analog) ==")
    print(df.to_string(index=False, float_format=lambda x: f"{x:.3f}"))
    print("\n== paper (Email, k = 16) ==")
    print(PAPER_CASE_STUDY.to_string(index=False))


if __name__ == "__main__":
    main()
