"""HoloClean/Aimnet-like cleaning baseline (DESIGN.md §1.3).

Behaviourally-faithful simulation of HoloClean's null-repair path as
Table 5 / Figure 7 characterize it: the system "generates multiple
tables containing dataset information throughout its cleaning process"
— domain tables, pairwise co-occurrence statistics, and per-cell
feature tables — then runs inference epochs to pick repairs. Its memory
therefore grows with the dataset's size and value-domain cardinalities,
and it OOMs on the large datasets (#11-#13), while accuracy on small
data is competitive (it recovers values from co-occurrence structure,
ignoring the downstream task).

The ``memory_budget_bytes`` models the paper VM's 189 GB at our ~1/12
data scale; estimated co-occurrence memory above the budget raises
:class:`HoloCleanOOM` *before* allocation, like the real OOM kill.
"""
from __future__ import annotations

import time
from itertools import combinations

import numpy as np
import pandas as pd

DEFAULT_MEMORY_BUDGET = 1_500_000_000  # ~1.5 GB simulated budget


class HoloCleanOOM(MemoryError):
    """Raised when the co-occurrence tables exceed the memory budget."""


def _domains(pdf: pd.DataFrame) -> dict[str, np.ndarray]:
    return {c: pdf[c].dropna().unique() for c in pdf.columns}


def estimate_cooccurrence_bytes(pdf: pd.DataFrame) -> int:
    """Memory of the pairwise co-occurrence tables: Σ |dom_a|·|dom_b|·8."""
    doms = {c: len(v) for c, v in _domains(pdf).items()}
    total = 0
    for a, b in combinations(pdf.columns, 2):
        total += doms[a] * doms[b] * 8
    return total


def clean(
    pdf: pd.DataFrame,
    memory_budget_bytes: int = DEFAULT_MEMORY_BUDGET,
    epochs: int = 3,
) -> tuple[pd.DataFrame, dict]:
    """Impute nulls via co-occurrence inference. Returns (clean, stats).

    Raises :class:`HoloCleanOOM` when the estimated working set exceeds
    the budget — reproducing the paper's OOM rows without actually
    exhausting the machine.
    """
    t0 = time.perf_counter()
    est = estimate_cooccurrence_bytes(pdf)
    if est > memory_budget_bytes:
        raise HoloCleanOOM(
            f"estimated co-occurrence memory {est/1e9:.2f} GB exceeds "
            f"budget {memory_budget_bytes/1e9:.2f} GB"
        )
    out = pdf.copy()
    doms = _domains(pdf)
    # build the co-occurrence tables (the memory hog, actually allocated)
    cooc: dict[tuple[str, str], pd.DataFrame] = {}
    bytes_allocated = 0
    for a, b in combinations(pdf.columns, 2):
        tab = pd.crosstab(pdf[a], pdf[b])
        cooc[(a, b)] = tab
        bytes_allocated += tab.size * 8
    # inference epochs: repair each null cell from co-occurring attributes
    for _ in range(epochs):
        for col in pdf.columns:
            null_idx = out.index[out[col].isna()]
            if len(null_idx) == 0:
                continue
            for i in null_idx:
                votes: dict = {}
                for other in pdf.columns:
                    if other == col or pd.isna(out.at[i, other]):
                        continue
                    key = (col, other) if (col, other) in cooc else (other, col)
                    tab = cooc.get(key)
                    if tab is None:
                        continue
                    try:
                        row = (
                            tab.loc[:, out.at[i, other]]
                            if key == (col, other)
                            else tab.loc[out.at[i, other], :]
                        )
                    except KeyError:
                        continue
                    best = row.idxmax()
                    votes[best] = votes.get(best, 0) + int(row.max())
                if votes:
                    out.at[i, col] = max(votes, key=votes.get)
        # fall back to column centers for anything still null
    for col in out.columns:
        if out[col].isna().any():
            if pd.api.types.is_numeric_dtype(out[col]):
                out[col] = out[col].fillna(out[col].mean())
            else:
                mode = out[col].mode()
                out[col] = out[col].fillna(mode.iloc[0] if len(mode) else "missing")
    stats = {
        "estimated_bytes": est,
        "allocated_bytes": bytes_allocated,
        "domains": {c: len(v) for c, v in doms.items()},
        "seconds": time.perf_counter() - t0,
    }
    return out, stats
