"""Tests for the AutoLearn-like transformation baseline."""
import numpy as np
import pandas as pd
import pytest

from repro.baselines.autolearn_like import (
    AutoLearnOOM,
    AutoLearnTimeout,
    _distance_correlation,
    generate_features,
)


def test_distance_correlation_detects_dependence():
    g = np.random.default_rng(0)
    x = g.normal(0, 1, 200)
    assert _distance_correlation(x, 2 * x + 0.01 * g.normal(0, 1, 200)) > 0.9
    assert _distance_correlation(x, x**2) > 0.3  # nonlinear still detected
    assert _distance_correlation(x, g.normal(0, 1, 200)) < 0.3


def test_generates_features_for_correlated_pairs():
    g = np.random.default_rng(1)
    base = g.normal(0, 1, 150)
    pdf = pd.DataFrame(
        {
            "a": base,
            "b": 3 * base + g.normal(0, 0.05, 150),
            "target": (base > 0).astype(int),
        }
    )
    out, stats = generate_features(pdf, time_budget_s=30)
    assert stats["features_added"] >= 1
    assert out.shape[1] > pdf.shape[1]


def test_independent_features_add_nothing():
    g = np.random.default_rng(2)
    pdf = pd.DataFrame(
        {
            "a": g.normal(0, 1, 100),
            "b": g.normal(0, 1, 100),
            "target": g.integers(0, 2, 100),
        }
    )
    out, stats = generate_features(pdf, time_budget_s=30)
    assert stats["features_added"] == 0
    assert out.shape[1] == pdf.shape[1]


def test_timeout_raised():
    g = np.random.default_rng(3)
    pdf = pd.DataFrame({f"f{i}": g.normal(0, 1, 2000) for i in range(8)})
    pdf["target"] = g.integers(0, 2, 2000)
    with pytest.raises(AutoLearnTimeout):
        generate_features(pdf, time_budget_s=0.05)


def test_oom_raised_for_large_n():
    g = np.random.default_rng(4)
    pdf = pd.DataFrame({"a": g.normal(0, 1, 20_000), "target": [0, 1] * 10_000})
    with pytest.raises(AutoLearnOOM):
        generate_features(pdf, memory_budget_bytes=100_000_000)
