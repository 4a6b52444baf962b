"""T5 (paper Figure 6): scalability of the randomized MapReduce outliers
algorithm with input size — inflated instances (SMOTE-like, Section 5.3)
h times the base dataset, coresets of size 8*(k + 6z/ell), parallelism
ell = 16. The paper uses h in {1, 25, 50, 100} on a 16-machine cluster; at
single-machine scale we sweep smaller h over smaller bases (the claim under
test — running time linear in |S| — is scale-free).
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import SparkSession

from repro.data.datasets import DATASETS, add_outliers, inflate
from repro.mapreduce.kcenter_outliers import experiment_tau, mr_kcenter_outliers


def run(
    spark: SparkSession,
    *,
    base_n: int = 20_000,
    hs=(1, 2, 4, 8),
    k: int = 20,
    z: int = 200,
    ell: int = 16,
    mu: float = 8,
    names=("higgs", "power", "wiki"),
    repeats: int = 1,
    eps_hat: float = 0.05,
    seed: int = 0,
) -> pd.DataFrame:
    tau = experiment_tau(mu, k, z, ell, randomized=True)
    rows = []
    for i, name in enumerate(names):
        base = DATASETS[name](base_n, seed=seed + i)
        for h in hs:
            X = inflate(base, h, seed=seed + 13 * h)
            X, _ = add_outliers(X, z, seed=seed + 100 + i)
            for rep in range(repeats):
                res = mr_kcenter_outliers(
                    spark, X, k, z, ell, tau=tau, eps_hat=eps_hat,
                    randomized=True, seed=seed + 31 * rep,
                )
                rows.append(
                    {
                        "dataset": name,
                        "h": h,
                        "n": len(X),
                        "rep": rep,
                        "tau": tau,
                        "radius": res.radius,
                        "t_coreset": res.t_coreset,
                        "t_cluster": res.t_cluster,
                        "t_total": res.t_coreset + res.t_cluster,
                    }
                )
    df = pd.DataFrame(rows)
    return (
        df.groupby(["dataset", "h", "n"], as_index=False)
        .agg(
            tau=("tau", "first"),
            radius=("radius", "mean"),
            t_coreset=("t_coreset", "mean"),
            t_cluster=("t_cluster", "mean"),
            t_total=("t_total", "mean"),
        )
        .sort_values(["dataset", "h"])
        .reset_index(drop=True)
    )
