"""Tests for the numpy model-evaluation substrate (S8)."""
import numpy as np
import pytest

from repro.automation.forest import (
    LogisticRegressionClassifier,
    RandomForestClassifier,
    accuracy,
    cross_val_score,
    f1_weighted,
    stratified_folds,
)


@pytest.fixture(scope="module")
def blobs():
    g = np.random.default_rng(0)
    X = np.vstack([g.normal(-2, 1, (200, 4)), g.normal(2, 1, (200, 4))])
    y = np.array([0] * 200 + [1] * 200)
    return X, y


def test_forest_learns_separable(blobs):
    X, y = blobs
    clf = RandomForestClassifier(n_estimators=10, max_depth=5).fit(X, y)
    assert accuracy(y, clf.predict(X)) > 0.95


def test_logistic_learns_separable(blobs):
    X, y = blobs
    clf = LogisticRegressionClassifier(epochs=200).fit(X, y)
    assert accuracy(y, clf.predict(X)) > 0.95


def test_forest_multiclass():
    g = np.random.default_rng(1)
    X = np.vstack([g.normal(i * 4, 1, (100, 3)) for i in range(3)])
    y = np.repeat([0, 1, 2], 100)
    clf = RandomForestClassifier(n_estimators=10, max_depth=6).fit(X, y)
    assert accuracy(y, clf.predict(X)) > 0.9


def test_forest_string_labels(blobs):
    X, y = blobs
    labels = np.where(y == 0, "neg", "pos")
    clf = RandomForestClassifier(n_estimators=5, max_depth=4).fit(X, labels)
    assert set(clf.predict(X[:5])) <= {"neg", "pos"}


def test_f1_weighted_perfect_and_worst():
    y = np.array([0, 0, 1, 1])
    assert f1_weighted(y, y) == pytest.approx(1.0)
    assert f1_weighted(y, 1 - y) == pytest.approx(0.0)


def test_f1_weighted_class_imbalance():
    y_true = np.array([0] * 90 + [1] * 10)
    y_pred = np.zeros(100)
    # class 0 f1 ~0.947 weighted 0.9; class 1 f1 0 weighted 0.1
    assert 0.8 < f1_weighted(y_true, y_pred) < 0.9


def test_stratified_folds_preserve_classes():
    y = np.array([0] * 30 + [1] * 9)
    folds = stratified_folds(y, 3)
    for f in folds:
        assert (y[f] == 1).sum() == 3


def test_cross_val_degenerate_returns_zero():
    assert cross_val_score(
        lambda: RandomForestClassifier(), np.zeros((20, 2)), np.zeros(20)
    ) == 0.0
    assert cross_val_score(
        lambda: RandomForestClassifier(), np.zeros((3, 2)), np.array([0, 1, 0])
    ) == 0.0


def test_cross_val_reasonable(blobs):
    X, y = blobs
    s = cross_val_score(
        lambda: RandomForestClassifier(n_estimators=10, max_depth=5), X, y, k=3
    )
    assert s > 0.9


def test_logistic_scale_sensitivity():
    """The S9 rationale: raw skewed features hurt logistic regression."""
    g = np.random.default_rng(2)
    z = g.normal(0, 2, 600)
    y = (z > 0).astype(int)
    X_warped = np.exp(1.5 * z).reshape(-1, 1) * 1000
    X_log = np.log(X_warped)
    raw = cross_val_score(lambda: LogisticRegressionClassifier(epochs=150), X_warped, y, k=3)
    log = cross_val_score(lambda: LogisticRegressionClassifier(epochs=150), X_log, y, k=3, metric=accuracy)
    assert log > raw
