"""Random forest over CART trees (gini impurity), implemented in numpy.

This is the reproduction's "classic classifier" #2 (stand-in for the
scikit-learn Random Forest the paper uses; see DESIGN.md §2). Bootstrap
sampling + sqrt-feature subsampling per split; the split search sorts
each candidate feature once and scores every distinct threshold with
vectorized cumulative class counts (exact CART, no quantile capping).
"""
from __future__ import annotations

import numpy as np

__all__ = ["DecisionTree", "RandomForest"]


def _gini(counts: np.ndarray) -> float:
    n = counts.sum()
    if n == 0:
        return 0.0
    p = counts / n
    return 1.0 - float(np.sum(p * p))


class DecisionTree:
    """CART classifier stored as parallel node arrays (no recursion at
    predict time). Leaves store the positive-class fraction."""

    def __init__(
        self,
        *,
        max_depth: int = 6,
        min_samples_leaf: int = 2,
        max_features: int | None = None,
        seed: int = 0,
    ) -> None:
        self.max_depth = max_depth
        self.min_samples_leaf = min_samples_leaf
        self.max_features = max_features
        self.seed = seed
        # node arrays: feature (-1 for leaf), threshold, left, right, value
        self._feat: list[int] = []
        self._thr: list[float] = []
        self._left: list[int] = []
        self._right: list[int] = []
        self._val: list[float] = []

    def _best_split(
        self, X: np.ndarray, y: np.ndarray, rng: np.random.Generator
    ) -> tuple[int, float] | None:
        """Vectorized exact split search: per candidate feature, sort
        once and score every distinct threshold with cumulative counts."""
        n, d = X.shape
        k = self.max_features or d
        feats = rng.choice(d, size=min(k, d), replace=False)
        parent_gini = _gini(np.bincount(y, minlength=2))
        best: tuple[int, float] | None = None
        best_gain = 1e-9
        msl = self.min_samples_leaf
        for f in feats:
            col = X[:, f]
            order = np.argsort(col, kind="stable")
            cs = col[order]
            ys = y[order]
            # split after position i ⇒ left = first i+1 rows
            cut = np.nonzero(cs[:-1] < cs[1:])[0]  # valid distinct-value cuts
            if cut.size == 0:
                continue
            nl = cut + 1
            nr = n - nl
            ok = (nl >= msl) & (nr >= msl)
            if not ok.any():
                continue
            cut, nl, nr = cut[ok], nl[ok], nr[ok]
            c1l = np.cumsum(ys)[cut].astype(float)
            c1r = ys.sum() - c1l
            p1l = c1l / nl
            p1r = c1r / nr
            gl = 1.0 - p1l**2 - (1 - p1l) ** 2
            gr = 1.0 - p1r**2 - (1 - p1r) ** 2
            gain = parent_gini - (nl * gl + nr * gr) / n
            i = int(np.argmax(gain))
            if gain[i] > best_gain:
                best_gain = float(gain[i])
                best = (int(f), float((cs[cut[i]] + cs[cut[i] + 1]) / 2.0))
        return best

    def _grow(self, X: np.ndarray, y: np.ndarray, depth: int, rng) -> int:
        idx = len(self._feat)
        self._feat.append(-1)
        self._thr.append(0.0)
        self._left.append(-1)
        self._right.append(-1)
        self._val.append(float(y.mean()) if y.size else 0.5)
        if depth >= self.max_depth or y.size < 2 * self.min_samples_leaf or len(np.unique(y)) == 1:
            return idx
        split = self._best_split(X, y, rng)
        if split is None:
            return idx
        f, thr = split
        mask = X[:, f] <= thr
        self._feat[idx] = f
        self._thr[idx] = thr
        self._left[idx] = self._grow(X[mask], y[mask], depth + 1, rng)
        self._right[idx] = self._grow(X[~mask], y[~mask], depth + 1, rng)
        return idx

    def fit(self, X: np.ndarray, y: np.ndarray) -> "DecisionTree":
        X = np.asarray(X, dtype=float)
        y = np.asarray(y, dtype=int).ravel()
        rng = np.random.default_rng(self.seed)
        self._feat, self._thr, self._left, self._right, self._val = [], [], [], [], []
        self._grow(X, y, 0, rng)
        return self

    def predict_proba(self, X: np.ndarray) -> np.ndarray:
        X = np.asarray(X, dtype=float)
        out = np.empty(X.shape[0])
        feat = np.asarray(self._feat)
        thr = np.asarray(self._thr)
        left = np.asarray(self._left)
        right = np.asarray(self._right)
        val = np.asarray(self._val)
        for i, row in enumerate(X):
            node = 0
            while feat[node] >= 0:
                node = left[node] if row[feat[node]] <= thr[node] else right[node]
            out[i] = val[node]
        return out


class RandomForest:
    """Bagged CART ensemble; predict_proba averages leaf fractions."""

    def __init__(
        self,
        *,
        n_estimators: int = 60,
        max_depth: int = 6,
        min_samples_leaf: int = 2,
        seed: int = 0,
    ) -> None:
        self.n_estimators = n_estimators
        self.max_depth = max_depth
        self.min_samples_leaf = min_samples_leaf
        self.seed = seed
        self.trees_: list[DecisionTree] = []

    def fit(self, X: np.ndarray, y: np.ndarray) -> "RandomForest":
        X = np.asarray(X, dtype=float)
        y = np.asarray(y, dtype=int).ravel()
        n, d = X.shape
        k = max(1, int(np.sqrt(d)))
        rng = np.random.default_rng(self.seed)
        self.trees_ = []
        for t in range(self.n_estimators):
            boot = rng.integers(0, n, n)
            tree = DecisionTree(
                max_depth=self.max_depth,
                min_samples_leaf=self.min_samples_leaf,
                max_features=k,
                seed=int(rng.integers(0, 2**31 - 1)),
            )
            tree.fit(X[boot], y[boot])
            self.trees_.append(tree)
        return self

    def predict_proba(self, X: np.ndarray) -> np.ndarray:
        if not self.trees_:
            raise RuntimeError("fit() first")
        return np.mean([t.predict_proba(X) for t in self.trees_], axis=0)

    def predict(self, X: np.ndarray) -> np.ndarray:
        return (self.predict_proba(X) >= 0.5).astype(int)
