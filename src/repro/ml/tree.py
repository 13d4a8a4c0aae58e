"""CART regression tree (scikit-learn substitute).

Supports multi-output targets (the parameter model predicts 2–3 PPM
scalars jointly, like a multi-output ``RandomForestRegressor`` would).
Splits minimise the summed per-output variance (MSE criterion), matching
sklearn's regression-tree behaviour with default parameters.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np


@dataclass
class _Node:
    """One tree node; a leaf iff ``feature < 0``."""

    value: np.ndarray  # mean target vector of the samples in this node
    feature: int = -1
    threshold: float = 0.0
    left: "_Node | None" = None
    right: "_Node | None" = None


@dataclass
class DecisionTreeRegressor:
    """Greedy best-split CART tree with MSE criterion.

    ``max_features`` ∈ (0, 1] is the fraction of features examined at each
    split (sklearn's RF-regressor default is 1.0). ``min_samples_split``
    and ``min_samples_leaf`` match sklearn defaults (2 and 1).
    """

    max_depth: int | None = None
    min_samples_split: int = 2
    min_samples_leaf: int = 1
    max_features: float = 1.0
    random_state: int | None = None
    root_: _Node | None = field(default=None, repr=False)
    n_features_: int = 0

    def fit(self, X: np.ndarray, y: np.ndarray) -> "DecisionTreeRegressor":
        X = np.asarray(X, dtype=float)
        y = np.asarray(y, dtype=float)
        if y.ndim == 1:
            y = y[:, None]
        self.n_features_ = X.shape[1]
        rng = np.random.default_rng(self.random_state)
        self.root_ = self._grow(X, y, depth=0, rng=rng)
        return self

    def _grow(self, X: np.ndarray, y: np.ndarray, depth: int, rng) -> _Node:
        node = _Node(value=y.mean(axis=0))
        n = X.shape[0]
        if (
            n < self.min_samples_split
            or (self.max_depth is not None and depth >= self.max_depth)
            or np.allclose(y, y[0])
        ):
            return node
        k = max(1, int(round(self.max_features * self.n_features_)))
        feats = (
            np.arange(self.n_features_)
            if k >= self.n_features_
            else rng.choice(self.n_features_, size=k, replace=False)
        )
        best = self._best_split(X, y, feats)
        if best is None:
            return node
        f, thr = best
        mask = X[:, f] <= thr
        node.feature, node.threshold = f, thr
        node.left = self._grow(X[mask], y[mask], depth + 1, rng)
        node.right = self._grow(X[~mask], y[~mask], depth + 1, rng)
        return node

    def _best_split(self, X, y, feats) -> tuple[int, float] | None:
        """Best (feature, threshold) by minimum weighted child SSE.

        Fully vectorised over candidate thresholds: cumulative sums give
        left/right SSE for every split position in O(n) per feature.
        """
        n = X.shape[0]
        lo, hi = self.min_samples_leaf, n - self.min_samples_leaf
        if lo >= hi + 1:
            return None
        best_score, best = np.inf, None
        for f in feats:
            order = np.argsort(X[:, f], kind="stable")
            xs, ys = X[order, f], y[order]
            csum = np.cumsum(ys, axis=0)
            csum2 = np.cumsum(ys * ys, axis=0)
            tot, tot2 = csum[-1], csum2[-1]
            i = np.arange(lo, hi + 1)  # left sizes; split between i-1 and i
            i = i[(i >= 1) & (i < n)]
            if i.size == 0:
                continue
            valid = xs[i - 1] != xs[i]
            i = i[valid]
            if i.size == 0:
                continue
            ls, ls2 = csum[i - 1], csum2[i - 1]
            left = (ls2 - ls * ls / i[:, None]).sum(axis=1)
            ri = (n - i)[:, None]
            right = ((tot2 - ls2) - (tot - ls) ** 2 / ri).sum(axis=1)
            sse = left + right
            j = int(np.argmin(sse))
            if sse[j] < best_score - 1e-12:
                best_score = float(sse[j])
                k = int(i[j])
                best = (int(f), float((xs[k - 1] + xs[k]) / 2.0))
        return best

    def predict(self, X: np.ndarray) -> np.ndarray:
        if self.root_ is None:
            raise RuntimeError("tree is not fitted")
        X = np.asarray(X, dtype=float)
        out = np.empty((X.shape[0], self.root_.value.shape[0]))
        for i, row in enumerate(X):
            node = self.root_
            while node.feature >= 0:
                node = node.left if row[node.feature] <= node.threshold else node.right
            out[i] = node.value
        return out

    def to_dict(self) -> dict:
        """Serialise the fitted tree for the portable model format."""

        def enc(node: _Node | None):
            if node is None:
                return None
            return {
                "value": node.value.tolist(),
                "feature": node.feature,
                "threshold": node.threshold,
                "left": enc(node.left),
                "right": enc(node.right),
            }

        return {"n_features": self.n_features_, "root": enc(self.root_)}

    @classmethod
    def from_dict(cls, d: dict) -> "DecisionTreeRegressor":
        def dec(nd):
            if nd is None:
                return None
            return _Node(
                value=np.asarray(nd["value"], dtype=float),
                feature=nd["feature"],
                threshold=nd["threshold"],
                left=dec(nd["left"]),
                right=dec(nd["right"]),
            )

        t = cls()
        t.n_features_ = d["n_features"]
        t.root_ = dec(d["root"])
        return t
