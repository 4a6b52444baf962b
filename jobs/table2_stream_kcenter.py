"""T2 / Figure 3: streaming k-center — CORESETSTREAM vs BASESTREAM,
approximation ratio and throughput vs space. No Spark needed (the paper
evaluated streaming with a sequential simulation).
Run: python jobs/table2_stream_kcenter.py [--n N] [--repeats R]
"""
import argparse

from repro.experiments import table2_stream_kcenter as t2
from repro.experiments.common import print_table, save_csv


def main() -> None:
    ap = argparse.ArgumentParser(description=__doc__)
    ap.add_argument("--n", type=int, default=20_000)
    ap.add_argument("--repeats", type=int, default=3)
    ap.add_argument("--seed", type=int, default=0)
    args = ap.parse_args()
    df = t2.run(n=args.n, repeats=args.repeats, seed=args.seed)
    print_table(df, "T2 / Figure 3 — streaming k-center: ratio & throughput vs space")
    print("saved:", save_csv(df, "table2_stream_kcenter"))


if __name__ == "__main__":
    main()
