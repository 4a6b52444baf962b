"""T6 (paper Figure 7): scalability of the randomized MapReduce outliers
algorithm with the number of processors — fixed union-of-coresets size
U = mu*(ell_max*k + 6z) (the paper's 8*(16k + 6z), i.e. the mu=8, ell=16
cell of Figure 4), per-partition budget tau_ell = U/ell, ell in
{1,2,4,8,16}. The coreset-construction time should scale superlinearly in
ell (per-reducer work ~ tau_ell * |S|/ell has an extra ell in the
denominator) while the OutliersCluster time stays constant.
"""
from __future__ import annotations

import math

import pandas as pd
from pyspark.sql import SparkSession

from repro.experiments.common import make_datasets
from repro.mapreduce.kcenter_outliers import mr_kcenter_outliers


def run(
    spark: SparkSession,
    *,
    n: int = 20_000,
    ells=(1, 2, 4, 8, 16),
    k: int = 20,
    z: int = 200,
    mu: float = 8,
    ell_max: int = 16,
    names=("higgs", "power", "wiki"),
    repeats: int = 1,
    eps_hat: float = 0.05,
    seed: int = 0,
) -> pd.DataFrame:
    union = int(mu * (ell_max * k + 6 * z))
    data = make_datasets(n, z=z, names=names, seed=seed)
    rows = []
    for name in names:
        X, _ = data[name]
        for ell in ells:
            # Per-partition budget giving the same union size at every ell;
            # capped below the partition size so GMM stays well-defined.
            tau = min(math.ceil(union / ell), len(X) // ell)
            for rep in range(repeats):
                res = mr_kcenter_outliers(
                    spark, X, k, z, ell, tau=tau, eps_hat=eps_hat,
                    randomized=True, seed=seed + 31 * rep,
                )
                rows.append(
                    {
                        "dataset": name,
                        "ell": ell,
                        "rep": rep,
                        "tau": tau,
                        "union": res.coreset_size,
                        "radius": res.radius,
                        "t_coreset": res.t_coreset,
                        "t_cluster": res.t_cluster,
                        "t_total": res.t_coreset + res.t_cluster,
                    }
                )
    df = pd.DataFrame(rows)
    return (
        df.groupby(["dataset", "ell"], as_index=False)
        .agg(
            tau=("tau", "first"),
            union=("union", "mean"),
            radius=("radius", "mean"),
            t_coreset=("t_coreset", "mean"),
            t_cluster=("t_cluster", "mean"),
            t_total=("t_total", "mean"),
        )
        .sort_values(["dataset", "ell"])
        .reset_index(drop=True)
    )
