"""T6 / Figure 7: scalability with parallelism ell at fixed union-of-
coresets size; reports coreset-construction vs OutliersCluster time.
Run: python jobs/table6_scale_procs.py [--n N] [--ells 1,2,4,8,16]
"""
import argparse

from repro.experiments import table6_scale_procs as t6
from repro.experiments.common import print_table, save_csv
from repro.experiments.session import get_session


def main() -> None:
    ap = argparse.ArgumentParser(description=__doc__)
    ap.add_argument("--n", type=int, default=40_000)
    ap.add_argument("--ells", default="1,2,4,8,16")
    ap.add_argument("--k", type=int, default=10)
    ap.add_argument("--z", type=int, default=100)
    ap.add_argument("--repeats", type=int, default=3)
    ap.add_argument("--seed", type=int, default=0)
    args = ap.parse_args()
    ells = tuple(int(e) for e in args.ells.split(","))
    spark = get_session("table6-scale-procs")
    try:
        df = t6.run(
            spark, n=args.n, ells=ells, k=args.k, z=args.z,
            repeats=args.repeats, seed=args.seed,
        )
    finally:
        spark.stop()
    print_table(df, "T6 / Figure 7 — scalability with parallelism")
    print("saved:", save_csv(df, "table6_scale_procs"))


if __name__ == "__main__":
    main()
