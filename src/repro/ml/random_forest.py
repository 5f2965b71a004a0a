"""Random forest regression, from scratch in numpy.

The paper trains "a random forest regression model to predict the weights
based on the statistics" (§4.1.1) using Python's scipy stack; neither
scipy nor scikit-learn is installed in this container, so this module
implements the estimator itself: variance-reduction CART trees grown on
bootstrap samples with per-split feature subsampling, averaged at predict
time.

Splits are found by an O(n log n) exhaustive scan per feature (sort once,
prefix sums of y and y^2 give the variance of every threshold in one
pass), which is the textbook regression-tree criterion.
"""
from __future__ import annotations

import numpy as np


class _Tree:
    """One CART regression tree, stored as flat arrays."""

    def __init__(self, max_depth: int, min_leaf: int, rng: np.random.Generator,
                 max_features: float):
        self.max_depth = max_depth
        self.min_leaf = min_leaf
        self.rng = rng
        self.max_features = max_features
        # node arrays, grown dynamically
        self.feature: list[int] = []
        self.threshold: list[float] = []
        self.left: list[int] = []
        self.right: list[int] = []
        self.value: list[float] = []

    def fit(self, X: np.ndarray, y: np.ndarray) -> None:
        self._grow(X, y, depth=0)

    def _new_node(self) -> int:
        self.feature.append(-1)
        self.threshold.append(0.0)
        self.left.append(-1)
        self.right.append(-1)
        self.value.append(0.0)
        return len(self.feature) - 1

    def _grow(self, X: np.ndarray, y: np.ndarray, depth: int) -> int:
        node = self._new_node()
        self.value[node] = float(y.mean())
        n = y.size
        if depth >= self.max_depth or n < 2 * self.min_leaf or np.ptp(y) == 0:
            return node
        n_feat = X.shape[1]
        k = max(1, int(round(self.max_features * n_feat)))
        feats = self.rng.choice(n_feat, size=k, replace=False)
        best = (np.inf, -1, 0.0)  # (weighted sse, feature, threshold)
        for f in feats:
            order = np.argsort(X[:, f], kind="stable")
            xs, ys = X[order, f], y[order]
            # candidate split after position i (1..n-1) where value changes
            csum = np.cumsum(ys)
            csq = np.cumsum(ys * ys)
            idx = np.arange(1, n)
            valid = xs[1:] != xs[:-1]
            idx = idx[valid]
            idx = idx[(idx >= self.min_leaf) & (idx <= n - self.min_leaf)]
            if idx.size == 0:
                continue
            nl = idx.astype(np.float64)
            nr = n - nl
            sl, sr = csum[idx - 1], csum[-1] - csum[idx - 1]
            ql, qr = csq[idx - 1], csq[-1] - csq[idx - 1]
            sse = (ql - sl * sl / nl) + (qr - sr * sr / nr)
            j = int(np.argmin(sse))
            if sse[j] < best[0]:
                thr = 0.5 * (xs[idx[j] - 1] + xs[idx[j]])
                best = (float(sse[j]), int(f), float(thr))
        if best[1] < 0:
            return node
        f, thr = best[1], best[2]
        mask = X[:, f] <= thr
        if mask.all() or not mask.any():
            return node
        self.feature[node] = f
        self.threshold[node] = thr
        self.left[node] = self._grow(X[mask], y[mask], depth + 1)
        self.right[node] = self._grow(X[~mask], y[~mask], depth + 1)
        return node

    def _freeze(self) -> None:
        """Convert node lists to arrays once after fit (for fast predict)."""
        self._feature = np.asarray(self.feature)
        self._threshold = np.asarray(self.threshold)
        self._left = np.asarray(self.left)
        self._right = np.asarray(self.right)
        self._value = np.asarray(self.value)

    def predict(self, X: np.ndarray) -> np.ndarray:
        """Vectorized level-synchronous traversal: every row advances one
        node per iteration until all rows sit on leaves (≤ max_depth
        iterations of O(n) gathers, no per-row Python loop)."""
        feature, threshold = self._feature, self._threshold
        left, right, value = self._left, self._right, self._value
        node = np.zeros(X.shape[0], dtype=np.int64)
        active = feature[node] >= 0
        while active.any():
            idx = np.where(active)[0]
            nd = node[idx]
            f = feature[nd]
            go_left = X[idx, f] <= threshold[nd]
            node[idx] = np.where(go_left, left[nd], right[nd])
            active[idx] = feature[node[idx]] >= 0
        return value[node]


class RandomForestRegressor:
    """Bootstrap-aggregated CART regressor (drop-in minimal estimator).

    Parameters mirror the scikit-learn names so the cost model reads
    naturally: ``n_estimators`` trees, each grown to ``max_depth`` on a
    bootstrap resample, considering ``max_features`` of the features per
    split; predictions are the mean over trees.
    """

    def __init__(self, n_estimators: int = 30, max_depth: int = 12,
                 min_samples_leaf: int = 2, max_features: float = 0.7,
                 seed: int = 0):
        self.n_estimators = n_estimators
        self.max_depth = max_depth
        self.min_samples_leaf = min_samples_leaf
        self.max_features = max_features
        self.seed = seed
        self.trees: list[_Tree] = []

    def fit(self, X: np.ndarray, y: np.ndarray) -> "RandomForestRegressor":
        X = np.asarray(X, dtype=np.float64)
        y = np.asarray(y, dtype=np.float64)
        if X.ndim != 2 or y.ndim != 1 or X.shape[0] != y.size:
            raise ValueError(f"bad shapes X={X.shape} y={y.shape}")
        rng = np.random.default_rng(self.seed)
        n = y.size
        self.trees = []
        for _ in range(self.n_estimators):
            idx = rng.integers(0, n, n)
            t = _Tree(self.max_depth, self.min_samples_leaf, rng, self.max_features)
            t.fit(X[idx], y[idx])
            t._freeze()
            self.trees.append(t)
        return self

    def predict(self, X: np.ndarray) -> np.ndarray:
        X = np.atleast_2d(np.asarray(X, dtype=np.float64))
        if not self.trees:
            raise RuntimeError("predict() before fit()")
        acc = np.zeros(X.shape[0])
        for t in self.trees:
            acc += t.predict(X)
        return acc / len(self.trees)
