"""Tests for the five cleaning operations and the drop-nulls baseline."""
import numpy as np
import pandas as pd
import pytest

from repro.automation.cleaning import (
    CLEANING_OPERATIONS,
    apply_cleaning_operations,
    apply_fillna,
    apply_interpolate,
    apply_iterative_imputer,
    apply_knn_imputer,
    apply_simple_imputer,
    baseline_drop_nulls,
)


@pytest.fixture()
def frame():
    g = np.random.default_rng(0)
    pdf = pd.DataFrame(
        {
            "x": [1.0, np.nan, 3.0, 4.0, np.nan, 6.0, 7.0, 8.0],
            "y": [10.0, 20.0, 30.0, 40.0, 50.0, 60.0, 70.0, 80.0],
            "c": ["a", "b", None, "a", "a", "b", "a", "a"],
        }
    )
    return pdf


@pytest.mark.parametrize("op", CLEANING_OPERATIONS)
def test_every_operation_removes_all_nulls(op, frame):
    out = apply_cleaning_operations(op, frame)
    assert not out.isna().any().any(), op
    assert out.shape == frame.shape


def test_unknown_operation_raises(frame):
    with pytest.raises(ValueError):
        apply_cleaning_operations("Magic", frame)


def test_fillna_uses_zero_and_missing(frame):
    out = apply_fillna(frame)
    assert out.loc[1, "x"] == 0.0
    assert out.loc[2, "c"] == "missing"


def test_interpolate_recovers_arithmetic_sequence(frame):
    out = apply_interpolate(frame)
    assert out.loc[1, "x"] == pytest.approx(2.0)
    assert out.loc[4, "x"] == pytest.approx(5.0)


def test_simple_imputer_mean_and_mode(frame):
    out = apply_simple_imputer(frame)
    assert out.loc[1, "x"] == pytest.approx(frame["x"].mean())
    assert out.loc[2, "c"] == "a"


def test_knn_imputer_uses_neighbors():
    g = np.random.default_rng(1)
    # two tight clusters; the missing value must come from its own cluster
    a = g.normal(0, 0.1, (50, 2))
    b = g.normal(10, 0.1, (50, 2))
    pdf = pd.DataFrame(np.vstack([a, b]), columns=["u", "v"])
    pdf.loc[0, "u"] = np.nan  # cluster A row
    out = apply_knn_imputer(pdf)
    assert abs(out.loc[0, "u"]) < 1.0  # near cluster A, not global mean (~5)


def test_iterative_imputer_recovers_linear_relation():
    g = np.random.default_rng(2)
    base = g.normal(0, 5, 200)
    pdf = pd.DataFrame({"a": base, "b": 3 * base + g.normal(0, 0.01, 200)})
    pdf.loc[5, "b"] = np.nan
    out = apply_iterative_imputer(pdf)
    assert out.loc[5, "b"] == pytest.approx(3 * base[5], abs=0.5)


def test_baseline_drop_nulls(frame):
    out = baseline_drop_nulls(frame)
    assert len(out) == 5
    assert not out.isna().any().any()


def test_all_null_column_handled():
    pdf = pd.DataFrame({"x": [np.nan, np.nan], "y": [1.0, 2.0]})
    for op in CLEANING_OPERATIONS:
        out = apply_cleaning_operations(op, pdf)
        assert not out.isna().any().any(), op
