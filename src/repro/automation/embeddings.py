"""In-memory dataset embeddings for on-demand automation (§4.1).

At inference time "the GNN model takes the unseen dataset in the form of
a DataFrame and calculates the CoLR embedding for each column" — no
Spark job, no raw-data-scale work: the model input is the fixed-size
1800-dim table embedding regardless of dataset size. This module
computes those embeddings directly from a pandas DataFrame with the same
CoLR models the Spark profiler uses.
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from repro.core import colr
from repro.core.type_inference import infer_fine_grained_type
from repro.core.types import EMBEDDED_TYPES, EMBEDDING_DIM, FineGrainedType


def column_embeddings(
    pdf: pd.DataFrame,
) -> dict[str, tuple[FineGrainedType, np.ndarray]]:
    """fgt + 300-dim CoLR embedding per column."""
    out = {}
    for col in pdf.columns:
        s = pdf[col]
        fgt = infer_fine_grained_type(s)
        out[str(col)] = (fgt, colr.embed_values(s.dropna().to_numpy(), fgt))
    return out


def table_embedding_1800(
    pdf: pd.DataFrame, only_missing: bool = False
) -> np.ndarray:
    """Concatenated per-type averages (§4.2).

    With ``only_missing=True``, averages only the columns that contain
    missing values — the paper's initialization for the cleaning model.
    Falls back to all columns when nothing is missing.
    """
    cols = pdf.columns
    if only_missing:
        with_na = [c for c in cols if pdf[c].isna().any()]
        cols = with_na if with_na else cols
    embs = column_embeddings(pdf[list(cols)])
    blocks = []
    for fgt in EMBEDDED_TYPES:
        of_type = [e for t, e in embs.values() if t == fgt]
        blocks.append(
            np.mean(of_type, axis=0) if of_type else np.zeros(EMBEDDING_DIM)
        )
    return np.concatenate(blocks)
