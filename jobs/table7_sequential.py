"""T7 / Figure 8: sequential comparison — CHARIKARETAL vs MALKOMESETAL
(mu=1) vs the paper's improved sequential algorithm (mu in {2,4,8}).
Run: python jobs/table7_sequential.py [--n 10000]
"""
import argparse

from repro.experiments import table7_sequential as t7
from repro.experiments.common import print_table, save_csv


def main() -> None:
    ap = argparse.ArgumentParser(description=__doc__)
    ap.add_argument("--n", type=int, default=3_000)
    ap.add_argument("--k", type=int, default=10)
    ap.add_argument("--z", type=int, default=100)
    ap.add_argument("--repeats", type=int, default=3)
    ap.add_argument("--seed", type=int, default=0)
    args = ap.parse_args()
    df = t7.run(
        n=args.n, k=args.k, z=args.z, repeats=args.repeats, seed=args.seed
    )
    print_table(df, "T7 / Figure 8 — sequential: time & radius")
    print("saved:", save_csv(df, "table7_sequential"))


if __name__ == "__main__":
    main()
