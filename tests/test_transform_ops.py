"""Tests for scalers and unary column transforms (§4.3)."""
import numpy as np
import pandas as pd
import pytest

from repro.automation.transformation import (
    COLUMN_TRANSFORMS,
    TABLE_TRANSFORMS,
    apply_column_transform,
    apply_scaler,
    apply_transformations,
)


@pytest.fixture()
def frame():
    g = np.random.default_rng(0)
    return pd.DataFrame(
        {
            "a": g.normal(100, 15, 300),
            "b": g.uniform(0, 1e5, 300),
            "cat": ["x", "y", "z"] * 100,
        }
    )


def test_standard_scaler(frame):
    out = apply_scaler("StandardScaler", frame)
    assert out["a"].mean() == pytest.approx(0.0, abs=1e-9)
    assert out["a"].std(ddof=0) == pytest.approx(1.0, abs=1e-6)
    assert list(out["cat"]) == list(frame["cat"])  # untouched


def test_minmax_scaler(frame):
    out = apply_scaler("MinMaxScaler", frame)
    assert out["b"].min() == pytest.approx(0.0)
    assert out["b"].max() == pytest.approx(1.0)


def test_robust_scaler_centers_on_median(frame):
    out = apply_scaler("RobustScaler", frame)
    assert np.median(out["a"]) == pytest.approx(0.0, abs=1e-9)


def test_robust_scaler_resists_outliers():
    x = pd.DataFrame({"v": [1.0] * 98 + [2.0, 1e9]})
    out_std = apply_scaler("StandardScaler", x)
    out_rob = apply_scaler("RobustScaler", x)
    # standard scaling is destroyed by the outlier; robust is not
    assert abs(out_std["v"].iloc[0] - out_std["v"].iloc[98]) < 1e-3
    assert abs(out_rob["v"].iloc[0] - out_rob["v"].iloc[98]) > 0.5


@pytest.mark.parametrize("name", TABLE_TRANSFORMS)
def test_all_scalers_run(name, frame):
    out = apply_scaler(name, frame)
    assert out.shape == frame.shape


def test_unknown_scaler_raises(frame):
    with pytest.raises(ValueError):
        apply_scaler("PowerScaler", frame)


def test_log_transform_linearizes():
    z = np.linspace(-2, 2, 100)
    warped = pd.Series(np.exp(3 * z))
    out = apply_column_transform("log", warped)
    corr = np.corrcoef(out, z)[0, 1]
    raw_corr = np.corrcoef(warped, z)[0, 1]
    assert corr > 0.9
    assert corr > raw_corr  # linearization improved the linear fit


def test_sqrt_transform():
    s = pd.Series([0.0, 1.0, 4.0, 9.0])
    out = apply_column_transform("sqrt", s)
    assert list(out) == [0.0, 1.0, 2.0, 3.0]


def test_none_transform_identity():
    s = pd.Series([1.0, 2.0])
    assert apply_column_transform("none", s).equals(s)


@pytest.mark.parametrize("name", COLUMN_TRANSFORMS)
def test_transforms_handle_negatives(name):
    s = pd.Series([-4.0, -1.0, 0.0, 1.0, 4.0])
    out = apply_column_transform(name, s)
    assert np.isfinite(out).all()


def test_apply_transformations_scales_then_transforms(frame):
    out = apply_transformations("MinMaxScaler", {"a": "sqrt"}, frame)
    assert out["a"].max() <= 1.0
    assert out.shape == frame.shape
