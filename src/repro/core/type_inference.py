"""Fine-grained data type inference (paper §3.2).

Classifies a column into one of the 7 fine-grained types:
boolean -> int -> float -> date -> named_entity -> natural_language ->
string (fallback). Named entities are detected with the (gazetteer) NER
model; natural-language text is detected by the existence of word
embeddings — here, membership in ``ENGLISH_VOCAB`` — for the value's
tokens, exactly the paper's criterion.
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from . import ner
from .types import FineGrainedType
from .word_embeddings import ENGLISH_VOCAB

_BOOL_VOCAB = {"true", "false", "t", "f", "yes", "no", "y", "n", "0", "1",
               "0.0", "1.0"}
_MAX_SAMPLE = 500


def _non_null_sample(values: pd.Series) -> pd.Series:
    s = values.dropna()
    s = s[s.astype(str).str.strip() != ""]
    if len(s) > _MAX_SAMPLE:
        s = s.sample(_MAX_SAMPLE, random_state=0)
    return s


def _is_boolean(s: pd.Series) -> bool:
    distinct = {str(v).strip().lower() for v in s.unique()}
    return 0 < len(distinct) <= 2 and distinct <= _BOOL_VOCAB


def _nl_ratio(s: pd.Series) -> float:
    """Fraction of tokens that have a word embedding (are in-vocab)."""
    hits = total = 0
    for v in s:
        for tok in str(v).lower().split():
            tok = tok.strip(".,!?;:'\"()")
            if tok:
                total += 1
                hits += tok in ENGLISH_VOCAB
    return hits / total if total else 0.0


def infer_fine_grained_type(values: pd.Series) -> FineGrainedType:
    """Infer the fine-grained type of a column from (a sample of) values."""
    s = _non_null_sample(values)
    if s.empty:
        return FineGrainedType.STRING
    if pd.api.types.is_bool_dtype(values.dtype):
        return FineGrainedType.BOOLEAN
    if _is_boolean(s):
        return FineGrainedType.BOOLEAN
    if pd.api.types.is_integer_dtype(values.dtype):
        return FineGrainedType.INT
    if pd.api.types.is_float_dtype(values.dtype):
        num = s.to_numpy(dtype="float64")
        return (
            FineGrainedType.INT
            if np.all(num == np.rint(num))
            else FineGrainedType.FLOAT
        )
    if pd.api.types.is_datetime64_any_dtype(values.dtype):
        return FineGrainedType.DATE
    as_str = s.astype(str).str.strip()
    num = pd.to_numeric(as_str, errors="coerce")
    if num.notna().mean() >= 0.95:
        v = num.dropna().to_numpy(dtype="float64")
        return (
            FineGrainedType.INT
            if np.all(v == np.rint(v))
            else FineGrainedType.FLOAT
        )
    # only attempt date parsing on date-shaped strings — pandas "mixed"
    # parsing is permissive enough to misread postal codes as timezones
    dateish = as_str.str.match(
        r"^\d{4}[-/]\d{1,2}[-/]\d{1,2}([ T]\d{2}:\d{2}(:\d{2})?)?$"
        r"|^\d{1,2}[-/]\d{1,2}[-/]\d{2,4}$"
    )
    if dateish.mean() >= 0.95:
        dates = pd.to_datetime(as_str, errors="coerce", format="mixed")
        if dates.notna().mean() >= 0.95:
            return FineGrainedType.DATE
    if ner.entity_ratio(as_str) >= 0.5:
        return FineGrainedType.NAMED_ENTITY
    if _nl_ratio(as_str) >= 0.5 and as_str.str.split().str.len().mean() >= 3:
        return FineGrainedType.NATURAL_LANGUAGE
    return FineGrainedType.STRING
