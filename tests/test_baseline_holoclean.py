"""Tests for the HoloClean-like cleaning baseline."""
import numpy as np
import pandas as pd
import pytest

from repro.baselines.holoclean_like import (
    HoloCleanOOM,
    clean,
    estimate_cooccurrence_bytes,
)


def test_cleans_all_nulls():
    pdf = pd.DataFrame(
        {
            "a": ["x", "y", None, "x", "y", "x"],
            "b": ["1", "2", "1", "1", "2", None],
        }
    )
    out, stats = clean(pdf)
    assert not out.isna().any().any()
    assert stats["seconds"] >= 0


def test_cooccurrence_recovers_dependent_value():
    """b is a function of a — co-occurrence inference must recover it."""
    g = np.random.default_rng(0)
    a = g.choice(["r", "g", "b"], 300)
    b = np.where(a == "r", "red", np.where(a == "g", "green", "blue"))
    pdf = pd.DataFrame({"a": a, "b": b})
    pdf.loc[7, "b"] = None
    out, _ = clean(pdf)
    expected = {"r": "red", "g": "green", "b": "blue"}[pdf.loc[7, "a"]]
    assert out.loc[7, "b"] == expected


def test_memory_estimate_grows_with_domains():
    small = pd.DataFrame({"a": [1, 2] * 50, "b": [3, 4] * 50})
    big = pd.DataFrame({"a": np.arange(100), "b": np.arange(100) + 0.5})
    assert estimate_cooccurrence_bytes(big) > estimate_cooccurrence_bytes(small)


def test_oom_on_high_cardinality():
    g = np.random.default_rng(1)
    n = 3000
    pdf = pd.DataFrame({f"f{i}": g.normal(0, 1, n) for i in range(4)})
    pdf.loc[0, "f0"] = np.nan
    with pytest.raises(HoloCleanOOM):
        clean(pdf, memory_budget_bytes=10_000_000)


def test_oom_is_raised_before_allocation():
    """The guard must fire on the *estimate*, not after allocating."""
    g = np.random.default_rng(2)
    pdf = pd.DataFrame({f"f{i}": g.normal(0, 1, 50_000) for i in range(3)})
    with pytest.raises(HoloCleanOOM):
        clean(pdf, memory_budget_bytes=1)


def test_numeric_fallback_mean():
    pdf = pd.DataFrame(
        {"a": [1.0, 2.0, 3.0, np.nan], "b": [5.5, 6.5, 7.5, 8.5]}
    )
    out, _ = clean(pdf)
    assert out["a"].iloc[3] == pytest.approx(2.0)
