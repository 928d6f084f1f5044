"""AutoLearn-like transformation baseline (DESIGN.md §1.3).

Behaviourally-faithful simulation of AutoLearn [32] as §6.3.2 describes
it: compute **distance correlation** between all feature pairs (an
O(n²)-memory statistic per pair), classify correlated pairs into linear
and non-linear, and generate new features from pairwise regressions
(predicted value + residual), then select informative ones. The n² × d²
work is why AutoLearn's time and memory blow up with dataset size —
reproduced here with a wall-clock ``time_budget_s`` (the paper's 3-hour
limit, scaled) and a memory budget for the n×n distance matrices.
"""
from __future__ import annotations

import time

import numpy as np
import pandas as pd


class AutoLearnTimeout(TimeoutError):
    """Raised when feature generation exceeds the (scaled) time budget."""


class AutoLearnOOM(MemoryError):
    """Raised when the n×n distance matrices exceed the memory budget."""


def _distance_correlation(x: np.ndarray, y: np.ndarray) -> float:
    """Székely's distance correlation via full n×n distance matrices."""
    n = len(x)
    a = np.abs(x[:, None] - x[None, :])
    b = np.abs(y[:, None] - y[None, :])
    A = a - a.mean(0) - a.mean(1)[:, None] + a.mean()
    B = b - b.mean(0) - b.mean(1)[:, None] + b.mean()
    dcov2 = (A * B).mean()
    dvarx = (A * A).mean()
    dvary = (B * B).mean()
    if dvarx <= 0 or dvary <= 0:
        return 0.0
    return float(np.sqrt(max(0.0, dcov2) / np.sqrt(dvarx * dvary)))


def generate_features(
    pdf: pd.DataFrame,
    target_col: str = "target",
    *,
    time_budget_s: float = 20.0,
    memory_budget_bytes: int = 1_000_000_000,
    corr_threshold: float = 0.5,
) -> tuple[pd.DataFrame, dict]:
    """AutoLearn's pipeline: dcor -> pairwise regressions -> new features.

    Returns (augmented dataset, stats). Raises AutoLearnTimeout /
    AutoLearnOOM exactly where the real system fails on large inputs.
    """
    t0 = time.perf_counter()
    feats = [c for c in pdf.columns if c != target_col
             and pd.api.types.is_numeric_dtype(pdf[c])]
    n = len(pdf)
    # two n×n float64 distance matrices + the centered copies
    if 4 * n * n * 8 > memory_budget_bytes:
        raise AutoLearnOOM(
            f"distance matrices need {4*n*n*8/1e9:.2f} GB > budget"
        )
    X = pdf[feats].to_numpy(dtype="float64")
    X = np.nan_to_num(X)
    out = pdf.copy()
    stats = {"pairs_tested": 0, "features_added": 0}
    for i in range(len(feats)):
        for j in range(len(feats)):
            if i == j:
                continue
            if time.perf_counter() - t0 > time_budget_s:
                raise AutoLearnTimeout(
                    f"time budget {time_budget_s}s exhausted after "
                    f"{stats['pairs_tested']} pairs"
                )
            stats["pairs_tested"] += 1
            dcor = _distance_correlation(X[:, i], X[:, j])
            if dcor < corr_threshold:
                continue
            xi, xj = X[:, i], X[:, j]
            # linear regression feature: prediction + residual
            A = np.column_stack([xi, np.ones(n)])
            w, *_ = np.linalg.lstsq(A, xj, rcond=None)
            pred = A @ w
            resid = xj - pred
            lin_r2 = 1.0 - resid.var() / (xj.var() + 1e-12)
            if lin_r2 > 0.5:
                out[f"lin_{feats[i]}_{feats[j]}"] = resid
            else:
                # non-linear (quadratic kernel) regression feature
                A2 = np.column_stack([xi, xi**2, np.ones(n)])
                w2, *_ = np.linalg.lstsq(A2, xj, rcond=None)
                out[f"nl_{feats[i]}_{feats[j]}"] = xj - A2 @ w2
            stats["features_added"] += 1
    stats["seconds"] = time.perf_counter() - t0
    return out, stats
