"""Shared cleaning-trait column generators (used by the pipeline corpus
AND the Table-5 evaluation datasets, so GNN recommendations transfer).

Each trait makes its near-optimal cleaning operation *mechanically*
near-optimal and leaves a *marginal-distribution* fingerprint that CoLR
embeddings (which see value populations, not row order or cross-column
structure) can recognize:

========== ===================== =================================
trait      fingerprint           why the planted op wins
========== ===================== =================================
smooth     near-arithmetic grid  Interpolate recovers the sequence
clustered  multimodal floats     KNNImputer reads the cluster off
                                 the observed columns
correlated heavy-tail (expo)     IterativeImputer regresses the
                                 missing column on its copies
plain      zero-inflated counts  Fillna(0) is the dominant-mode guess
categorical string columns       SimpleImputer(most_frequent)
========== ===================== =================================
"""
from __future__ import annotations

import numpy as np

TRAIT_KINDS = ["categorical", "clustered", "correlated", "plain", "smooth"]


def trait_numeric_columns(
    rng: np.random.Generator, kind: str, n: int, k: int
) -> dict[str, np.ndarray]:
    """k numeric columns embodying ``kind``'s fingerprint."""
    cols: dict[str, np.ndarray] = {}
    if kind == "smooth":
        for i in range(k):
            start = float(rng.uniform(-50, 50))
            step = float(rng.uniform(0.2, 3.0))
            cols[f"f{i}"] = (
                start + step * np.arange(n) + rng.normal(0, 0.05 * step, n)
            )
    elif kind == "clustered":
        centers = rng.normal(0, 8, (4, k))
        assign = rng.integers(0, 4, n)
        for i in range(k):
            cols[f"f{i}"] = centers[assign, i] + rng.normal(0, 0.5, n)
    elif kind == "correlated":
        base = rng.exponential(float(rng.uniform(2, 15)), n)
        cols["f0"] = base + rng.normal(0, 0.1, n)
        for i in range(1, k):
            a = float(rng.uniform(0.5, 3.0))
            cols[f"f{i}"] = a * base + rng.normal(0, 0.2, n)
    elif kind == "plain":
        for i in range(k):
            lam = float(rng.uniform(1, 5))
            counts = rng.poisson(lam, n).astype("float64")
            zero_mask = rng.random(n) < 0.55
            counts[zero_mask] = 0.0
            cols[f"f{i}"] = counts
    elif kind == "categorical":
        for i in range(k):
            cols[f"f{i}"] = rng.normal(float(rng.uniform(-3, 3)), 1.5, n)
    else:
        raise ValueError(kind)
    return {c: np.round(v, 4) for c, v in cols.items()}
