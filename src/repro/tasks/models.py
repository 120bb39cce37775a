"""Numpy model zoo for downstream tasks (sklearn is unavailable offline).

Implements the models the paper's tasks train: a random-forest-lite
(bagged, depth-limited CART trees), logistic regression, and ridge
regression, plus metrics and deterministic train/validation splitting.
All models are deterministic in their seed.
"""
from __future__ import annotations

import warnings
from dataclasses import dataclass

import numpy as np


def impute_mean(X: np.ndarray) -> np.ndarray:
    """Column-mean imputation of NaNs (all-NaN columns become zeros)."""
    X = X.astype("float64", copy=True)
    with np.errstate(invalid="ignore"), warnings.catch_warnings():
        warnings.simplefilter("ignore", category=RuntimeWarning)
        mu = np.nanmean(np.where(np.isfinite(X), X, np.nan), axis=0)
    mu = np.where(np.isfinite(mu), mu, 0.0)
    bad = ~np.isfinite(X)
    X[bad] = np.take(mu, np.nonzero(bad)[1])
    return X


def standardize(X: np.ndarray, mu=None, sd=None):
    """Z-score columns; returns (Xs, mu, sd) with sd floored at 1e-9."""
    if mu is None:
        mu = X.mean(axis=0)
        sd = X.std(axis=0)
    sd = np.where(sd > 1e-9, sd, 1.0)
    return (X - mu) / sd, mu, sd


def train_val_split(n: int, val_frac: float = 0.3, seed: int = 0):
    """Deterministic index split."""
    g = np.random.default_rng(seed)
    idx = g.permutation(n)
    n_val = max(1, int(val_frac * n))
    return idx[n_val:], idx[:n_val]


def accuracy(y_true: np.ndarray, y_pred: np.ndarray) -> float:
    return float((y_true == y_pred).mean())


def f1_score(y_true: np.ndarray, y_pred: np.ndarray) -> float:
    """Binary F1 with the positive class = 1."""
    tp = float(((y_pred == 1) & (y_true == 1)).sum())
    fp = float(((y_pred == 1) & (y_true == 0)).sum())
    fn = float(((y_pred == 0) & (y_true == 1)).sum())
    if tp == 0:
        return 0.0
    prec = tp / (tp + fp)
    rec = tp / (tp + fn)
    return 2 * prec * rec / (prec + rec)


def mae(y_true: np.ndarray, y_pred: np.ndarray) -> float:
    return float(np.abs(y_true - y_pred).mean())


@dataclass
class Ridge:
    """Closed-form ridge regression."""

    lam: float = 1.0
    coef_: np.ndarray | None = None
    intercept_: float = 0.0

    def fit(self, X: np.ndarray, y: np.ndarray) -> "Ridge":
        Xs, self._mu, self._sd = standardize(X)
        ym = y.mean()
        d = Xs.shape[1]
        A = Xs.T @ Xs + self.lam * np.eye(d)
        self.coef_ = np.linalg.solve(A, Xs.T @ (y - ym))
        self.intercept_ = float(ym)
        return self

    def predict(self, X: np.ndarray) -> np.ndarray:
        Xs, _, _ = standardize(X, self._mu, self._sd)
        return Xs @ self.coef_ + self.intercept_


@dataclass
class Logistic:
    """L2-regularized logistic regression via fixed-step gradient descent."""

    lam: float = 1e-2
    lr: float = 0.5
    iters: int = 200
    coef_: np.ndarray | None = None
    intercept_: float = 0.0

    def fit(self, X: np.ndarray, y: np.ndarray) -> "Logistic":
        Xs, self._mu, self._sd = standardize(X)
        n, d = Xs.shape
        w = np.zeros(d)
        b = 0.0
        for _ in range(self.iters):
            z = Xs @ w + b
            p = 1.0 / (1.0 + np.exp(-np.clip(z, -30, 30)))
            g = (p - y) / n
            w -= self.lr * (Xs.T @ g + self.lam * w)
            b -= self.lr * float(g.sum())
        self.coef_, self.intercept_ = w, b
        return self

    def predict_proba(self, X: np.ndarray) -> np.ndarray:
        Xs, _, _ = standardize(X, self._mu, self._sd)
        z = Xs @ self.coef_ + self.intercept_
        return 1.0 / (1.0 + np.exp(-np.clip(z, -30, 30)))

    def predict(self, X: np.ndarray) -> np.ndarray:
        return (self.predict_proba(X) >= 0.5).astype("int64")


@dataclass
class _Node:
    feature: int = -1
    threshold: float = 0.0
    left: "_Node | None" = None
    right: "_Node | None" = None
    value: float = 0.0


def _build_tree(
    X: np.ndarray,
    y: np.ndarray,
    depth: int,
    max_depth: int,
    min_leaf: int,
    feat_idx: np.ndarray,
    g: np.random.Generator,
    n_thresholds: int = 8,
) -> _Node:
    node = _Node(value=float(y.mean()))
    if depth >= max_depth or len(y) < 2 * min_leaf or y.std() < 1e-12:
        return node
    best = (0.0, -1, 0.0)  # (gain, feature, threshold)
    parent_var = y.var() * len(y)
    for f in feat_idx:
        col = X[:, f]
        qs = np.quantile(col, np.linspace(0.1, 0.9, n_thresholds))
        for thr in np.unique(qs):
            mask = col <= thr
            nl = int(mask.sum())
            if nl < min_leaf or len(y) - nl < min_leaf:
                continue
            var = y[mask].var() * nl + y[~mask].var() * (len(y) - nl)
            gain = parent_var - var
            if gain > best[0]:
                best = (gain, f, float(thr))
    if best[1] < 0:
        return node
    _, f, thr = best
    mask = X[:, f] <= thr
    node.feature, node.threshold = f, thr
    node.left = _build_tree(
        X[mask], y[mask], depth + 1, max_depth, min_leaf, feat_idx, g, n_thresholds
    )
    node.right = _build_tree(
        X[~mask], y[~mask], depth + 1, max_depth, min_leaf, feat_idx, g, n_thresholds
    )
    return node


def _predict_tree(node: _Node, X: np.ndarray) -> np.ndarray:
    out = np.empty(len(X))
    stack = [(node, np.arange(len(X)))]
    while stack:
        nd, idx = stack.pop()
        if nd.feature < 0 or nd.left is None:
            out[idx] = nd.value
            continue
        mask = X[idx, nd.feature] <= nd.threshold
        stack.append((nd.left, idx[mask]))
        stack.append((nd.right, idx[~mask]))
    return out


@dataclass
class RandomForest:
    """Bagged depth-limited regression trees; classification via 0.5 cut.

    Feature importance (used by the iARDA baseline) is the total variance
    reduction attributed to each feature across all split nodes.
    """

    n_trees: int = 15
    max_depth: int = 3
    min_leaf: int = 5
    max_features: float = 0.7
    seed: int = 0
    classification: bool = False

    def fit(self, X: np.ndarray, y: np.ndarray) -> "RandomForest":
        g = np.random.default_rng(self.seed)
        n, d = X.shape
        self._trees: list[_Node] = []
        self.feature_importances_ = np.zeros(d)
        k = max(1, int(self.max_features * d))
        for _ in range(self.n_trees):
            boot = g.integers(0, n, n)
            feat_idx = g.choice(d, size=k, replace=False)
            tree = _build_tree(
                X[boot], y[boot].astype("float64"), 0, self.max_depth,
                self.min_leaf, feat_idx, g,
            )
            self._accumulate_importance(tree, X[boot], y[boot].astype("float64"))
            self._trees.append(tree)
        s = self.feature_importances_.sum()
        if s > 0:
            self.feature_importances_ /= s
        return self

    def _accumulate_importance(self, node: _Node, X, y) -> None:
        if node.feature < 0 or node.left is None or len(y) == 0:
            return
        mask = X[:, node.feature] <= node.threshold
        gain = y.var() * len(y) - (
            (y[mask].var() * mask.sum() if mask.any() else 0.0)
            + (y[~mask].var() * (~mask).sum() if (~mask).any() else 0.0)
        )
        self.feature_importances_[node.feature] += max(gain, 0.0)
        self._accumulate_importance(node.left, X[mask], y[mask])
        self._accumulate_importance(node.right, X[~mask], y[~mask])

    def predict(self, X: np.ndarray) -> np.ndarray:
        raw = np.mean([_predict_tree(t, X) for t in self._trees], axis=0)
        if self.classification:
            return (raw >= 0.5).astype("int64")
        return raw
