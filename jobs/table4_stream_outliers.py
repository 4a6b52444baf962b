"""T4 / Figure 5: streaming k-center with z outliers — CORESETOUTLIERS vs
BASEOUTLIERS, ratio and throughput vs space. Sequential simulation.
Run: python jobs/table4_stream_outliers.py [--n N] [--k K] [--z Z]
"""
import argparse

from repro.experiments import table4_stream_outliers as t4
from repro.experiments.common import print_table, save_csv


def main() -> None:
    ap = argparse.ArgumentParser(description=__doc__)
    ap.add_argument("--n", type=int, default=20_000)
    ap.add_argument("--k", type=int, default=10)
    ap.add_argument("--z", type=int, default=100)
    ap.add_argument("--repeats", type=int, default=3)
    ap.add_argument("--seed", type=int, default=0)
    args = ap.parse_args()
    df = t4.run(
        n=args.n, k=args.k, z=args.z, repeats=args.repeats, seed=args.seed
    )
    print_table(df, "T4 / Figure 5 — streaming outliers: ratio & throughput vs space")
    print("saved:", save_csv(df, "table4_stream_outliers"))


if __name__ == "__main__":
    main()
