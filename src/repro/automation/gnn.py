"""One-layer GNN for node classification over the LiDS graph (§4.1-4.3).

The paper trains GNN models (via GraphSAINT sampling) that classify
dataset nodes — initialized with CoLR-derived embeddings — into the
cleaning / transformation operation applied by similar datasets'
pipelines. §4.2: "The GNN model has one layer, as there is only one
edge between a given table and its cleaning operation."

PyTorch is unavailable offline (S8), so the model is implemented in
numpy: one mean-aggregation message-passing layer over the node's
neighborhood followed by a softmax head, trained with Adam +
cross-entropy on sampled node batches (the GraphSAINT node-sampler
analogue).
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np


@dataclass
class GNNConfig:
    hidden: int = 64
    lr: float = 0.01
    epochs: int = 300
    batch: int = 64
    l2: float = 1e-4
    seed: int = 0


class OneLayerGNN:
    """h_v = relu(W_self·x_v + W_nbr·mean(x_u, u∈N(v))); ŷ = softmax(U·h_v).

    ``adjacency`` maps node index -> neighbor indices (dataset-graph
    context of the node, e.g. a table's columns). Nodes with no
    neighbors aggregate a zero message.
    """

    def __init__(self, n_classes: int, d_in: int, config: GNNConfig = GNNConfig()):
        self.cfg = config
        g = np.random.default_rng(config.seed)
        h = config.hidden
        self.W_self = g.standard_normal((d_in, h)) / np.sqrt(d_in)
        self.W_nbr = g.standard_normal((d_in, h)) / np.sqrt(d_in)
        self.b = np.zeros(h)
        self.U = g.standard_normal((h, n_classes)) / np.sqrt(h)
        self.c = np.zeros(n_classes)
        self.n_classes = n_classes

    # ---------- forward ----------
    def _agg(self, X: np.ndarray, adjacency: dict[int, list[int]], idx: np.ndarray) -> np.ndarray:
        out = np.zeros((len(idx), X.shape[1]))
        for i, v in enumerate(idx):
            nbrs = adjacency.get(int(v), [])
            if nbrs:
                out[i] = X[nbrs].mean(axis=0)
        return out

    def _forward(self, X, adjacency, idx):
        msg = self._agg(X, adjacency, idx)
        h = np.maximum(0.0, X[idx] @ self.W_self + msg @ self.W_nbr + self.b)
        logits = h @ self.U + self.c
        logits -= logits.max(axis=1, keepdims=True)
        p = np.exp(logits)
        p /= p.sum(axis=1, keepdims=True)
        return h, msg, p

    # ---------- training ----------
    def fit(
        self,
        X: np.ndarray,
        y: np.ndarray,
        adjacency: dict[int, list[int]] | None = None,
        train_idx: np.ndarray | None = None,
    ) -> "OneLayerGNN":
        adjacency = adjacency or {}
        X = np.asarray(X, dtype="float64")
        y = np.asarray(y)
        idx_all = (
            np.asarray(train_idx) if train_idx is not None else np.arange(len(y))
        )
        rng = np.random.default_rng(self.cfg.seed)
        params = [self.W_self, self.W_nbr, self.b, self.U, self.c]
        m = [np.zeros_like(p) for p in params]
        v = [np.zeros_like(p) for p in params]
        b1, b2, eps = 0.9, 0.999, 1e-8
        t = 0
        for _ in range(self.cfg.epochs):
            # GraphSAINT-style node sampling: one sampled subgraph batch
            batch = rng.choice(idx_all, size=min(self.cfg.batch, len(idx_all)),
                               replace=False)
            h, msg, p = self._forward(X, adjacency, batch)
            onehot = np.zeros((len(batch), self.n_classes))
            onehot[np.arange(len(batch)), y[batch]] = 1.0
            dlogits = (p - onehot) / len(batch)
            dU = h.T @ dlogits + self.cfg.l2 * self.U
            dc = dlogits.sum(axis=0)
            dh = dlogits @ self.U.T
            dh[h <= 0] = 0.0
            dW_self = X[batch].T @ dh + self.cfg.l2 * self.W_self
            dW_nbr = msg.T @ dh + self.cfg.l2 * self.W_nbr
            db = dh.sum(axis=0)
            grads = [dW_self, dW_nbr, db, dU, dc]
            t += 1
            for i, (param, grad) in enumerate(zip(params, grads)):
                m[i] = b1 * m[i] + (1 - b1) * grad
                v[i] = b2 * v[i] + (1 - b2) * grad * grad
                mhat = m[i] / (1 - b1**t)
                vhat = v[i] / (1 - b2**t)
                param -= self.cfg.lr * mhat / (np.sqrt(vhat) + eps)
        return self

    # ---------- inference ----------
    def predict_proba(
        self, X: np.ndarray, adjacency: dict[int, list[int]] | None = None,
        idx: np.ndarray | None = None,
    ) -> np.ndarray:
        X = np.asarray(X, dtype="float64")
        idx = np.asarray(idx) if idx is not None else np.arange(len(X))
        _, _, p = self._forward(X, adjacency or {}, idx)
        return p

    def predict(self, X, adjacency=None, idx=None) -> np.ndarray:
        return np.argmax(self.predict_proba(X, adjacency, idx), axis=1)
