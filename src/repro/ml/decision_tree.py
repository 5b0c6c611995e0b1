"""Numpy CART decision tree over categorical features.

Splits are binary equality tests ``x[attr] == value`` chosen by gini
gain, which on low-cardinality categorical attributes is equivalent to
one-hot-encoded axis splits — the same hypothesis class the paper's
scikit-learn tree searches on this data. Depth- and support-limited to
keep variance comparable to the paper's defaults.
"""
from __future__ import annotations

from dataclasses import dataclass, field
from typing import Optional

import numpy as np


@dataclass
class _Node:
    prediction: int
    attr: Optional[int] = None
    value: Optional[int] = None
    left: Optional["_Node"] = None  # x[attr] == value
    right: Optional["_Node"] = None  # x[attr] != value


def _gini(y: np.ndarray) -> float:
    if y.size == 0:
        return 0.0
    p = np.bincount(y).astype(float) / y.size
    return 1.0 - float((p * p).sum())


@dataclass
class DecisionTree:
    """CART classifier: fit(X, y) / predict(X) with integer labels."""

    max_depth: int = 8
    min_samples_split: int = 5
    _root: Optional[_Node] = field(default=None, repr=False)

    def fit(self, X: np.ndarray, y: np.ndarray) -> "DecisionTree":
        X = np.asarray(X, dtype=np.int64)
        y = np.asarray(y, dtype=np.int64)
        if X.ndim != 2 or X.shape[0] != y.shape[0]:
            raise ValueError("X must be (n, d) aligned with y")
        self._root = self._build(X, y, 0)
        return self

    def _build(self, X: np.ndarray, y: np.ndarray, depth: int) -> _Node:
        pred = int(np.bincount(y).argmax()) if y.size else 0
        node = _Node(prediction=pred)
        if (
            depth >= self.max_depth
            or y.size < self.min_samples_split
            or np.unique(y).size < 2
        ):
            return node
        base = _gini(y)
        best_gain, best = 1e-12, None
        for attr in range(X.shape[1]):
            col = X[:, attr]
            for value in np.unique(col):
                mask = col == value
                nl = int(mask.sum())
                if nl == 0 or nl == y.size:
                    continue
                gain = base - (
                    nl * _gini(y[mask]) + (y.size - nl) * _gini(y[~mask])
                ) / y.size
                if gain > best_gain:
                    best_gain, best = gain, (attr, int(value), mask)
        if best is None:
            return node
        attr, value, mask = best
        node.attr, node.value = attr, value
        node.left = self._build(X[mask], y[mask], depth + 1)
        node.right = self._build(X[~mask], y[~mask], depth + 1)
        return node

    def predict(self, X: np.ndarray) -> np.ndarray:
        if self._root is None:
            raise RuntimeError("predict() before fit()")
        X = np.asarray(X, dtype=np.int64)
        out = np.empty(X.shape[0], dtype=np.int64)
        for i, row in enumerate(X):
            node = self._root
            while node.attr is not None:
                node = node.left if row[node.attr] == node.value else node.right
            out[i] = node.prediction
        return out
