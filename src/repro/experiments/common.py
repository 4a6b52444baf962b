"""Shared bookkeeping for the experiment harnesses.

The paper reports solution quality as the *empirical approximation ratio*:
"the ratio between the radius of the returned clustering and the best
radius ever found across all experiments with the same dataset and
parameter configuration" (Section 5). ``add_ratio`` implements exactly
that normalization over a harness's result frame.
"""
from __future__ import annotations

import os

import numpy as np
import pandas as pd

from repro.data.datasets import DATASETS, add_outliers


def shuffled(points: np.ndarray, seed: int) -> np.ndarray:
    """A permuted copy — the paper shuffles the input between runs, which
    randomizes GMM's arbitrary first center and the stream order."""
    g = np.random.default_rng(seed)
    return points[g.permutation(len(points))]


def add_ratio(
    df: pd.DataFrame,
    group_cols: list[str],
    radius_col: str = "radius",
    out_col: str = "ratio",
) -> pd.DataFrame:
    """Empirical approximation ratio: radius / min(radius) within each
    dataset(+config) group of the sweep."""
    df = df.copy()
    best = df.groupby(group_cols)[radius_col].transform("min")
    df[out_col] = df[radius_col] / best.replace(0.0, np.nan)
    df[out_col] = df[out_col].fillna(1.0)
    return df


def make_datasets(
    n: int, *, z: int = 0, names=("higgs", "power", "wiki"), seed: int = 0
) -> dict[str, tuple[np.ndarray, np.ndarray]]:
    """Instantiate the named synthetic datasets at size ``n``, each with
    ``z`` injected outliers (Section 5.2 procedure). Returns
    name -> (points, outlier_mask)."""
    out = {}
    for i, name in enumerate(names):
        base = DATASETS[name](n, seed=seed + i)
        out[name] = add_outliers(base, z, seed=seed + 100 + i)
    return out


def print_table(df: pd.DataFrame, title: str, *, floatfmt: int = 3) -> None:
    """Render a harness result the way the paper's figure would tabulate it."""
    print(f"\n== {title} ==")
    with pd.option_context(
        "display.width", 200, "display.max_columns", 50, "display.max_rows", 500
    ):
        print(df.round(floatfmt).to_string(index=False))


def save_csv(df: pd.DataFrame, name: str, results_dir: str = "results") -> str:
    os.makedirs(results_dir, exist_ok=True)
    path = os.path.join(results_dir, f"{name}.csv")
    df.to_csv(path, index=False)
    return path
