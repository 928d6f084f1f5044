"""Tests for the one-layer numpy GNN (§4.2, S8)."""
import numpy as np
import pytest

from repro.automation.gnn import GNNConfig, OneLayerGNN


@pytest.fixture(scope="module")
def separable():
    g = np.random.default_rng(0)
    X = np.vstack([g.normal(i * 3, 0.5, (40, 10)) for i in range(3)])
    y = np.repeat([0, 1, 2], 40)
    return X, y


def test_learns_separable_classes(separable):
    X, y = separable
    gnn = OneLayerGNN(3, 10, GNNConfig(epochs=300, lr=0.02)).fit(X, y)
    assert (gnn.predict(X) == y).mean() > 0.95


def test_predict_proba_sums_to_one(separable):
    X, y = separable
    gnn = OneLayerGNN(3, 10, GNNConfig(epochs=50)).fit(X, y)
    p = gnn.predict_proba(X)
    assert p.shape == (len(X), 3)
    assert np.allclose(p.sum(axis=1), 1.0)


def test_neighbor_aggregation_used():
    """Nodes whose own features are uninformative can still be classified
    through their neighborhoods — the message-passing path works."""
    g = np.random.default_rng(1)
    n = 60
    X = np.zeros((2 * n, 6))
    X[n:] = g.normal(0, 0.1, (n, 6))  # target nodes: no signal of their own
    X[:n] = np.vstack(
        [g.normal(-3, 0.3, (n // 2, 6)), g.normal(3, 0.3, (n // 2, 6))]
    )
    adjacency = {n + i: [i] for i in range(n)}  # target i sees context node i
    y = np.array([0] * (n // 2) + [1] * (n // 2) + [0] * (n // 2) + [1] * (n // 2))
    train_idx = np.arange(n, 2 * n)
    gnn = OneLayerGNN(2, 6, GNNConfig(epochs=400, lr=0.02)).fit(
        X, y, adjacency, train_idx
    )
    acc = (gnn.predict(X, adjacency, train_idx) == y[train_idx]).mean()
    assert acc > 0.9


def test_deterministic_with_seed(separable):
    X, y = separable
    a = OneLayerGNN(3, 10, GNNConfig(epochs=50, seed=7)).fit(X, y).predict(X)
    b = OneLayerGNN(3, 10, GNNConfig(epochs=50, seed=7)).fit(X, y).predict(X)
    assert np.array_equal(a, b)


def test_single_layer_parameter_shapes():
    gnn = OneLayerGNN(5, 1800)
    assert gnn.W_self.shape == (1800, 64)
    assert gnn.W_nbr.shape == (1800, 64)
    assert gnn.U.shape == (64, 5)
