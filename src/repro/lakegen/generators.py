"""Typed value generators for synthetic data-lake columns (sub. S5).

One generator per fine-grained type, all deterministic in the supplied
``numpy`` Generator. Named-entity values are drawn from the same
gazetteers the NER model uses (so NER coverage mimics a pre-trained
model's coverage of real entities), and natural-language sentences are
composed from ``ENGLISH_VOCAB`` (so the word-embedding-existence test
fires, as it would for real English text).
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from repro.core import ner
from repro.core.word_embeddings import ENGLISH_VOCAB

_VOCAB = sorted(ENGLISH_VOCAB)
_GAZ_POOLS = {
    "PERSON": sorted(ner.PERSONS),
    "GPE": sorted(ner.COUNTRIES | ner.CITIES),
    "ORG": sorted(ner.ORGANIZATIONS),
    "LANGUAGE": sorted(ner.LANGUAGES),
    "PRODUCT": sorted(ner.PRODUCTS),
}


def int_values(rng: np.random.Generator, n: int, *, lo: int = 0, hi: int = 1000) -> pd.Series:
    return pd.Series(rng.integers(lo, max(lo + 1, hi), n))


def id_values(rng: np.random.Generator, n: int, *, start: int = 1) -> pd.Series:
    return pd.Series(np.arange(start, start + n))


def float_values(
    rng: np.random.Generator, n: int, *, mu: float = 50.0, sigma: float = 10.0,
    lognormal: bool = False,
) -> pd.Series:
    if lognormal:
        return pd.Series(rng.lognormal(np.log(max(mu, 1e-6)), 0.5, n).round(3))
    return pd.Series(rng.normal(mu, sigma, n).round(3))


def bool_values(rng: np.random.Generator, n: int, *, p_true: float = 0.5) -> pd.Series:
    return pd.Series(rng.choice(["true", "false"], n, p=[p_true, 1 - p_true]))


def date_values(
    rng: np.random.Generator, n: int, *, start: str = "2000-01-01", span_days: int = 7300
) -> pd.Series:
    base = pd.Timestamp(start)
    return pd.Series(base + pd.to_timedelta(rng.integers(0, span_days, n), unit="D"))


def named_entity_values(
    rng: np.random.Generator, n: int, *, etype: str = "PERSON",
    subpool: int | None = None,
) -> pd.Series:
    """Entities from a gazetteer; ``subpool`` selects a deterministic
    ~50% subset so distinct table families cover distinct entities (as
    real sources do) instead of all sampling the same global pool."""
    pool = _GAZ_POOLS[etype]
    if subpool is not None:
        sub_rng = np.random.default_rng(subpool)
        keep = sub_rng.random(len(pool)) < 0.5
        pool = [p for p, k in zip(pool, keep) if k] or pool
    vals = rng.choice(pool, n)
    return pd.Series([v.title() for v in vals])


def natural_language_values(
    rng: np.random.Generator, n: int, *, topic_seed: int = 0, words: int = 7
) -> pd.Series:
    """Short sentences from the english vocab, biased by a topic.

    The topic bias makes sentences of the same concept family share a
    sub-vocabulary, so CoLR content embeddings of unionable NL columns
    are closer than those of unrelated ones.
    """
    topic_rng = np.random.default_rng(topic_seed)
    topic_vocab = topic_rng.choice(_VOCAB, size=60, replace=False)
    out = []
    for _ in range(n):
        k = int(rng.integers(max(3, words - 2), words + 3))
        toks = rng.choice(topic_vocab, k) if rng.random() < 0.8 else rng.choice(_VOCAB, k)
        out.append(" ".join(toks))
    return pd.Series(out)


def string_values(
    rng: np.random.Generator, n: int, *, kind: str = "postal"
) -> pd.Series:
    letters = np.array(list("ABCDEFGHIJKLMNOPQRSTUVWXYZ"))
    digits = np.array(list("0123456789"))
    out = []
    for _ in range(n):
        if kind == "postal":
            out.append(
                "".join(rng.choice(letters, 1)) + "".join(rng.choice(digits, 1))
                + "".join(rng.choice(letters, 1)) + " "
                + "".join(rng.choice(digits, 1)) + "".join(rng.choice(letters, 1))
                + "".join(rng.choice(digits, 1))
            )
        elif kind == "hexid":
            out.append("0x" + "".join(rng.choice(np.array(list("0123456789abcdef")), 8)))
        else:  # product codes
            out.append("".join(rng.choice(letters, 3)) + "-" + "".join(rng.choice(digits, 4)))
    return pd.Series(out)
