"""T5 / Figure 6: scalability with input size of the randomized MR outliers
algorithm on SMOTE-inflated instances (h x base size).
Run: python jobs/table5_scale_size.py [--base-n N] [--hs 1,2,4,8]
"""
import argparse

from repro.experiments import table5_scale_size as t5
from repro.experiments.common import print_table, save_csv
from repro.experiments.session import get_session


def main() -> None:
    ap = argparse.ArgumentParser(description=__doc__)
    ap.add_argument("--base-n", type=int, default=20_000)
    ap.add_argument("--hs", default="1,2,4,8")
    ap.add_argument("--k", type=int, default=10)
    ap.add_argument("--z", type=int, default=100)
    ap.add_argument("--ell", type=int, default=8)
    ap.add_argument("--repeats", type=int, default=3)
    ap.add_argument("--seed", type=int, default=0)
    args = ap.parse_args()
    hs = tuple(int(h) for h in args.hs.split(","))
    spark = get_session("table5-scale-size")
    try:
        df = t5.run(
            spark, base_n=args.base_n, hs=hs, k=args.k, z=args.z,
            ell=args.ell, repeats=args.repeats, seed=args.seed,
        )
    finally:
        spark.stop()
    print_table(df, "T5 / Figure 6 — scalability with input size")
    print("saved:", save_csv(df, "table5_scale_size"))


if __name__ == "__main__":
    main()
