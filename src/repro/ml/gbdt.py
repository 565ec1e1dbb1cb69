"""Multiclass gradient-boosted decision trees — the XGBoost stand-in.

No xgboost wheel is available offline, so this module implements the
same algorithm family from scratch: second-order boosting with a
softmax objective, one regression tree per class per round, exact
greedy splits, and XGBoost's leaf weight ``-G/(H+λ)`` and split gain.

It also exposes :meth:`GBDT.leaf_values` — the per-tree leaf scores of
a sample, concatenated across rounds and classes. LoCEC-XGB (paper
Sec. IV-C) uses these as the community embedding ``r^C`` fed to the
Phase III logistic regression (the Facebook GBDT+LR trick, paper ref
[22]).
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np

from repro.ml.logreg import softmax


@dataclass
class _Node:
    feature: int = -1
    threshold: float = 0.0
    left: "_Node | None" = None
    right: "_Node | None" = None
    value: float = 0.0
    is_leaf: bool = False


class _Tree:
    """One regression tree fit to (gradient, hessian) pairs."""

    def __init__(self, max_depth: int, reg_lambda: float, gamma: float,
                 min_child_weight: float):
        self.max_depth = max_depth
        self.reg_lambda = reg_lambda
        self.gamma = gamma
        self.min_child_weight = min_child_weight
        self.root: _Node | None = None

    def _leaf_value(self, g: np.ndarray, h: np.ndarray) -> float:
        return float(-g.sum() / (h.sum() + self.reg_lambda))

    def _best_split(self, X, g, h):
        G, H = g.sum(), h.sum()
        base = G * G / (H + self.reg_lambda)
        best = (None, None, 0.0)  # feature, threshold, gain
        for f in range(X.shape[1]):
            order = np.argsort(X[:, f], kind="stable")
            xs, gs, hs = X[order, f], g[order], h[order]
            Gl = np.cumsum(gs)[:-1]
            Hl = np.cumsum(hs)[:-1]
            Gr, Hr = G - Gl, H - Hl
            valid = (xs[1:] != xs[:-1]) & (Hl >= self.min_child_weight) & (
                Hr >= self.min_child_weight
            )
            if not valid.any():
                continue
            gain = 0.5 * (
                Gl**2 / (Hl + self.reg_lambda)
                + Gr**2 / (Hr + self.reg_lambda)
                - base
            ) - self.gamma
            gain[~valid] = -np.inf
            i = int(np.argmax(gain))
            if gain[i] > best[2]:
                best = (f, float((xs[i] + xs[i + 1]) / 2), float(gain[i]))
        return best

    def _build(self, X, g, h, depth) -> _Node:
        if depth >= self.max_depth or len(g) < 2:
            return _Node(value=self._leaf_value(g, h), is_leaf=True)
        f, thr, gain = self._best_split(X, g, h)
        if f is None or gain <= 0:
            return _Node(value=self._leaf_value(g, h), is_leaf=True)
        mask = X[:, f] < thr
        return _Node(
            feature=f,
            threshold=thr,
            left=self._build(X[mask], g[mask], h[mask], depth + 1),
            right=self._build(X[~mask], g[~mask], h[~mask], depth + 1),
        )

    def fit(self, X, g, h) -> "_Tree":
        self.root = self._build(np.asarray(X), np.asarray(g), np.asarray(h), 0)
        return self

    def predict(self, X: np.ndarray) -> np.ndarray:
        out = np.empty(len(X))
        for i, row in enumerate(X):
            node = self.root
            while not node.is_leaf:
                node = node.left if row[node.feature] < node.threshold else node.right
            out[i] = node.value
        return out


@dataclass
class GBDT:
    """Softmax-objective gradient boosting, one tree per class per round."""

    n_classes: int
    n_rounds: int = 30
    max_depth: int = 3
    learning_rate: float = 0.3
    reg_lambda: float = 1.0
    gamma: float = 0.0
    min_child_weight: float = 1.0
    trees: list = field(default_factory=list, repr=False)  # [round][class]
    base_score: float = 0.0

    def fit(self, X: np.ndarray, y: np.ndarray) -> "GBDT":
        X = np.asarray(X, dtype=np.float64)
        y = np.asarray(y, dtype=np.int64)
        n = len(y)
        Y = np.eye(self.n_classes)[y]
        F = np.full((n, self.n_classes), self.base_score)
        self.trees = []
        for _ in range(self.n_rounds):
            P = softmax(F)
            G = P - Y                      # gradient of softmax CE
            H = np.maximum(P * (1 - P), 1e-6)  # diagonal hessian
            round_trees = []
            for k in range(self.n_classes):
                t = _Tree(self.max_depth, self.reg_lambda, self.gamma,
                          self.min_child_weight).fit(X, G[:, k], H[:, k])
                F[:, k] += self.learning_rate * t.predict(X)
                round_trees.append(t)
            self.trees.append(round_trees)
        return self

    def decision_function(self, X: np.ndarray) -> np.ndarray:
        X = np.asarray(X, dtype=np.float64)
        F = np.full((len(X), self.n_classes), self.base_score)
        for round_trees in self.trees:
            for k, t in enumerate(round_trees):
                F[:, k] += self.learning_rate * t.predict(X)
        return F

    def predict_proba(self, X: np.ndarray) -> np.ndarray:
        return softmax(self.decision_function(X))

    def predict(self, X: np.ndarray) -> np.ndarray:
        return self.decision_function(X).argmax(axis=1)

    def leaf_values(self, X: np.ndarray) -> np.ndarray:
        """Per-sample concatenated leaf values (rounds × classes dims).

        This is the community embedding ``r^C`` used by LoCEC-XGB in
        Phase III: "the values of the leaf nodes on the final layers of
        generated trees" (paper Sec. IV-C / ref [22]).
        """
        X = np.asarray(X, dtype=np.float64)
        cols = [t.predict(X) for round_trees in self.trees for t in round_trees]
        return np.stack(cols, axis=1) if cols else np.zeros((len(X), 0))
