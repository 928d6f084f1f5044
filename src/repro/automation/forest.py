"""Numpy model-evaluation substrate (substitution S8).

The paper scores cleaning/transformation systems by training a
scikit-learn random forest on the treated dataset and reporting
cross-validated F1/accuracy. scikit-learn is not installed in this
container, so this module implements the evaluation models in numpy:

* :class:`RandomForestClassifier` — bootstrap + depth-limited CART with
  gini impurity and random feature subsets (used for Table 5, as in the
  paper);
* :class:`LogisticRegressionClassifier` — multinomial logistic
  regression (used for Table 6; see S9 in DESIGN.md: axis-aligned trees
  are provably invariant to the monotone per-feature transforms KGLiDS
  recommends, so a scale-sensitive model is required for transformation
  quality to register at all);
* stratified k-fold cross-validation and F1 metrics.
"""
from __future__ import annotations

import numpy as np


def _gini_best_split(x: np.ndarray, y: np.ndarray, n_classes: int):
    """Best threshold on one feature by gini gain; vectorized scan."""
    order = np.argsort(x, kind="stable")
    xs, ys = x[order], y[order]
    n = len(ys)
    onehot = np.zeros((n, n_classes))
    onehot[np.arange(n), ys] = 1.0
    left_counts = np.cumsum(onehot, axis=0)  # counts for split after i
    total = left_counts[-1]
    boundaries = np.nonzero(np.diff(xs) > 1e-12)[0]
    if len(boundaries) == 0:
        return None
    nl = boundaries + 1.0
    nr = n - nl
    lc = left_counts[boundaries]
    rc = total - lc
    gini_l = 1.0 - np.sum((lc / nl[:, None]) ** 2, axis=1)
    gini_r = 1.0 - np.sum((rc / nr[:, None]) ** 2, axis=1)
    score = (nl * gini_l + nr * gini_r) / n
    best = int(np.argmin(score))
    thr = 0.5 * (xs[boundaries[best]] + xs[boundaries[best] + 1])
    return float(score[best]), thr


class _Tree:
    def __init__(self, max_depth: int, min_samples: int, max_features: int,
                 n_classes: int, rng: np.random.Generator):
        self.max_depth = max_depth
        self.min_samples = min_samples
        self.max_features = max_features
        self.n_classes = n_classes
        self.rng = rng
        self.nodes: list[tuple] = []  # (feat, thr, left, right) or (-1, probs)

    def fit(self, X: np.ndarray, y: np.ndarray) -> "_Tree":
        self._grow(X, y, 0)
        return self

    def _leaf(self, y: np.ndarray) -> int:
        probs = np.bincount(y, minlength=self.n_classes) / max(1, len(y))
        self.nodes.append((-1, probs, -1, -1))
        return len(self.nodes) - 1

    def _grow(self, X: np.ndarray, y: np.ndarray, depth: int) -> int:
        if (
            depth >= self.max_depth
            or len(y) < self.min_samples
            or len(np.unique(y)) == 1
        ):
            return self._leaf(y)
        feats = self.rng.choice(X.shape[1], size=min(self.max_features, X.shape[1]),
                                replace=False)
        best = None
        for f in feats:
            res = _gini_best_split(X[:, f], y, self.n_classes)
            if res is not None and (best is None or res[0] < best[0]):
                best = (res[0], f, res[1])
        if best is None:
            return self._leaf(y)
        _, f, thr = best
        mask = X[:, f] <= thr
        if mask.all() or not mask.any():
            return self._leaf(y)
        self.nodes.append(None)  # placeholder
        me = len(self.nodes) - 1
        left = self._grow(X[mask], y[mask], depth + 1)
        right = self._grow(X[~mask], y[~mask], depth + 1)
        self.nodes[me] = (int(f), float(thr), left, right)
        return me

    def predict_proba(self, X: np.ndarray) -> np.ndarray:
        """Vectorized routing: every row walks the tree together."""
        out = np.zeros((len(X), self.n_classes))
        stack = [(0, np.arange(len(X)))]  # root is always node 0
        while stack:
            node, idx = stack.pop()
            if len(idx) == 0:
                continue
            f, a, left, right = self.nodes[node]
            if f == -1:
                out[idx] = a
                continue
            mask = X[idx, f] <= a
            stack.append((left, idx[mask]))
            stack.append((right, idx[~mask]))
        return out


class RandomForestClassifier:
    """Bootstrap-aggregated CART forest (gini), numpy implementation."""

    def __init__(self, n_estimators: int = 25, max_depth: int = 10,
                 min_samples: int = 4, random_state: int = 0):
        self.n_estimators = n_estimators
        self.max_depth = max_depth
        self.min_samples = min_samples
        self.random_state = random_state
        self.trees: list[_Tree] = []
        self.classes_: np.ndarray | None = None

    def fit(self, X: np.ndarray, y: np.ndarray) -> "RandomForestClassifier":
        X = np.asarray(X, dtype="float64")
        self.classes_, y_enc = np.unique(y, return_inverse=True)
        n_classes = len(self.classes_)
        rng = np.random.default_rng(self.random_state)
        max_features = max(1, int(np.sqrt(X.shape[1])))
        self.trees = []
        for _ in range(self.n_estimators):
            idx = rng.integers(0, len(y_enc), len(y_enc))
            t = _Tree(self.max_depth, self.min_samples, max_features,
                      n_classes, rng).fit(X[idx], y_enc[idx])
            self.trees.append(t)
        return self

    def predict(self, X: np.ndarray) -> np.ndarray:
        X = np.asarray(X, dtype="float64")
        proba = sum(t.predict_proba(X) for t in self.trees)
        assert self.classes_ is not None
        return self.classes_[np.argmax(proba, axis=1)]


class LogisticRegressionClassifier:
    """Multinomial logistic regression, full-batch gradient descent."""

    def __init__(self, lr: float = 0.3, epochs: int = 300, l2: float = 1e-3):
        self.lr = lr
        self.epochs = epochs
        self.l2 = l2
        self.W: np.ndarray | None = None
        self.classes_: np.ndarray | None = None

    def fit(self, X: np.ndarray, y: np.ndarray) -> "LogisticRegressionClassifier":
        X = np.asarray(X, dtype="float64")
        Xb = np.column_stack([X, np.ones(len(X))])
        self.classes_, y_enc = np.unique(y, return_inverse=True)
        k = len(self.classes_)
        W = np.zeros((Xb.shape[1], k))
        onehot = np.zeros((len(y_enc), k))
        onehot[np.arange(len(y_enc)), y_enc] = 1.0
        for _ in range(self.epochs):
            logits = Xb @ W
            logits -= logits.max(axis=1, keepdims=True)
            p = np.exp(logits)
            p /= p.sum(axis=1, keepdims=True)
            grad = Xb.T @ (p - onehot) / len(y_enc) + self.l2 * W
            W -= self.lr * grad
        self.W = W
        return self

    def predict(self, X: np.ndarray) -> np.ndarray:
        X = np.asarray(X, dtype="float64")
        Xb = np.column_stack([X, np.ones(len(X))])
        assert self.W is not None and self.classes_ is not None
        return self.classes_[np.argmax(Xb @ self.W, axis=1)]


def f1_weighted(y_true: np.ndarray, y_pred: np.ndarray) -> float:
    """Weighted-average per-class F1 (the paper's Table-5 metric)."""
    y_true = np.asarray(y_true)
    y_pred = np.asarray(y_pred)
    classes, counts = np.unique(y_true, return_counts=True)
    total = counts.sum()
    score = 0.0
    for c, n_c in zip(classes, counts):
        tp = np.sum((y_pred == c) & (y_true == c))
        fp = np.sum((y_pred == c) & (y_true != c))
        fn = np.sum((y_pred != c) & (y_true == c))
        prec = tp / (tp + fp) if tp + fp else 0.0
        rec = tp / (tp + fn) if tp + fn else 0.0
        f1 = 2 * prec * rec / (prec + rec) if prec + rec else 0.0
        score += (n_c / total) * f1
    return float(score)


def accuracy(y_true: np.ndarray, y_pred: np.ndarray) -> float:
    y_true = np.asarray(y_true)
    return float(np.mean(y_true == np.asarray(y_pred))) if len(y_true) else 0.0


def stratified_folds(y: np.ndarray, k: int, seed: int = 0) -> list[np.ndarray]:
    """Index arrays of k stratified folds."""
    rng = np.random.default_rng(seed)
    folds: list[list[int]] = [[] for _ in range(k)]
    for c in np.unique(y):
        idx = np.nonzero(np.asarray(y) == c)[0]
        rng.shuffle(idx)
        for i, j in enumerate(idx):
            folds[i % k].append(int(j))
    return [np.array(sorted(f)) for f in folds]


def cross_val_score(
    model_factory, X: np.ndarray, y: np.ndarray, *, k: int = 3,
    metric=f1_weighted, seed: int = 0,
) -> float:
    """Mean metric over stratified k-fold CV. Returns 0.0 when the
    training data degenerates (empty or single-class), reproducing the
    paper's 00.00 baseline rows."""
    X = np.asarray(X, dtype="float64")
    y = np.asarray(y)
    if len(y) < k * 2 or len(np.unique(y)) < 2:
        return 0.0
    folds = stratified_folds(y, k, seed)
    scores = []
    for i in range(k):
        test_idx = folds[i]
        train_idx = np.concatenate([folds[j] for j in range(k) if j != i])
        if len(np.unique(y[train_idx])) < 2 or len(test_idx) == 0:
            scores.append(0.0)
            continue
        model = model_factory()
        model.fit(X[train_idx], y[train_idx])
        scores.append(metric(y[test_idx], model.predict(X[test_idx])))
    return float(np.mean(scores))
