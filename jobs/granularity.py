"""Time-granularity harness (Fig. 15 shape): TC vs DC total edges as
timestamps are merged 20/25/30/35/40-to-1.

Usage: python jobs/granularity.py [--sf 1.0] [--datasets email,youtube]
"""
import argparse

from repro.tables.perf import granularity_comparison


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--sf", type=float, default=1.0)
    ap.add_argument("--seed", type=int, default=7)
    ap.add_argument("--datasets", type=str, default="email,mathoverflow")
    args = ap.parse_args()
    for name in [d for d in args.datasets.split(",") if d]:
        df = granularity_comparison(name, sf=args.sf, seed=args.seed)
        print(f"== Fig. 15 shape: {name} ==")
        print(df.to_string(index=False, float_format=lambda x: f"{x:.4g}"))


if __name__ == "__main__":
    main()
