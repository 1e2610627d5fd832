"""Random forest classifier in numpy (sklearn substitute).

SIMPLE's M-step trains a random forest whose capacity is restricted by
``max_depth`` and ``ccp_alpha`` (minimal cost-complexity pruning) — the
container has no sklearn and Spark ML lacks ``ccp_alpha``, so this module
implements the needed subset from scratch:

* binary CART with Gini impurity and sample weights;
* exhaustive threshold search over unique feature values (vote features
  have ≤ 3 distinct values plus SMOTE interpolants, so this is cheap);
* minimal cost-complexity pruning identical in spirit to sklearn's
  ``ccp_alpha`` (normalized weighted risk);
* bagging with per-tree bootstrap weights and sqrt feature subsampling.

The fit happens driver-side over the (small) labeling matrix; prediction is
exposed both as a numpy call and through SIMPLE's distributed mapInPandas
scoring path.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np


@dataclass
class _Node:
    prob: float                 # P(y=1) at this node
    w: float                    # total sample weight
    impurity: float             # Gini 2p(1-p)
    feat: int | None = None
    thresh: float = 0.0
    left: "_Node | None" = None
    right: "_Node | None" = None

    @property
    def is_leaf(self) -> bool:
        return self.feat is None


def _gini(pos_w: float, tot_w: float) -> float:
    if tot_w <= 0:
        return 0.0
    p = pos_w / tot_w
    return 2.0 * p * (1.0 - p)


def _best_split(X, y, w, feats):
    """(feat, thresh, children_risk) minimizing weighted Gini risk."""
    tot_w = w.sum()
    tot_pos = float(w @ y)
    best = (None, 0.0, np.inf)
    wy = w * y
    for f in feats:
        x = X[:, f]
        vals, inv = np.unique(x, return_inverse=True)
        if len(vals) < 2:
            continue
        w_per = np.bincount(inv, weights=w, minlength=len(vals))
        wp_per = np.bincount(inv, weights=wy, minlength=len(vals))
        cw = np.cumsum(w_per)[:-1]
        cwp = np.cumsum(wp_per)[:-1]
        rw = tot_w - cw
        rwp = tot_pos - cwp
        with np.errstate(divide="ignore", invalid="ignore"):
            pl = np.where(cw > 0, cwp / cw, 0.0)
            pr = np.where(rw > 0, rwp / rw, 0.0)
        risk = cw * 2 * pl * (1 - pl) + rw * 2 * pr * (1 - pr)
        i = int(np.argmin(risk))
        if risk[i] < best[2] - 1e-12:
            best = (f, float((vals[i] + vals[i + 1]) / 2.0), float(risk[i]))
    return best


class DecisionTree:
    """Weighted binary CART with max-depth limit and ccp_alpha pruning."""

    def __init__(
        self,
        *,
        max_depth: int = 5,
        ccp_alpha: float = 0.0,
        min_weight_leaf: float = 1.0,
        max_features: int | None = None,
        seed: int = 0,
    ):
        self.max_depth = max_depth
        self.ccp_alpha = ccp_alpha
        self.min_weight_leaf = min_weight_leaf
        self.max_features = max_features
        self.rng = np.random.default_rng(seed)
        self.root: _Node | None = None

    def fit(self, X: np.ndarray, y: np.ndarray, w: np.ndarray | None = None):
        X = np.asarray(X, dtype=np.float32)
        y = np.asarray(y, dtype=np.float64)
        w = np.ones(len(y)) if w is None else np.asarray(w, dtype=np.float64)
        mask = w > 0
        X, y, w = X[mask], y[mask], w[mask]
        self._total_w = float(w.sum())
        self.root = self._grow(X, y, w, depth=0)
        if self.ccp_alpha > 0:
            self._prune(self.ccp_alpha)
        return self

    def _grow(self, X, y, w, depth) -> _Node:
        tot_w = float(w.sum())
        pos_w = float(w @ y)
        node = _Node(prob=pos_w / tot_w if tot_w else 0.5, w=tot_w,
                     impurity=_gini(pos_w, tot_w))
        if (
            depth >= self.max_depth
            or node.impurity <= 1e-12
            or tot_w < 2 * self.min_weight_leaf
            or len(y) < 2
        ):
            return node
        m = X.shape[1]
        if self.max_features and self.max_features < m:
            feats = self.rng.choice(m, size=self.max_features, replace=False)
        else:
            feats = range(m)
        feat, thresh, child_risk = _best_split(X, y, w, feats)
        parent_risk = node.impurity * tot_w
        if feat is None or child_risk >= parent_risk - 1e-12:
            return node
        go_left = X[:, feat] <= thresh
        lw, rw = float(w[go_left].sum()), float(w[~go_left].sum())
        if lw < self.min_weight_leaf or rw < self.min_weight_leaf:
            return node
        node.feat, node.thresh = int(feat), thresh
        node.left = self._grow(X[go_left], y[go_left], w[go_left], depth + 1)
        node.right = self._grow(X[~go_left], y[~go_left], w[~go_left], depth + 1)
        return node

    # --- minimal cost-complexity pruning -------------------------------
    def _prune(self, alpha: float):
        total = self._total_w or 1.0

        def leaf_stats(n: _Node):
            """(sum of leaf normalized risks, #leaves) under n."""
            if n.is_leaf:
                return n.impurity * n.w / total, 1
            rl, cl = leaf_stats(n.left)
            rr, cr = leaf_stats(n.right)
            return rl + rr, cl + cr

        while True:
            best_g, best_node = np.inf, None
            stack = [self.root]
            while stack:
                n = stack.pop()
                if n.is_leaf:
                    continue
                sub_risk, n_leaves = leaf_stats(n)
                own_risk = n.impurity * n.w / total
                g = (own_risk - sub_risk) / max(n_leaves - 1, 1)
                if g < best_g - 1e-15:
                    best_g, best_node = g, n
                stack.extend([n.left, n.right])
            if best_node is None or best_g > alpha:
                break
            best_node.feat = None
            best_node.left = best_node.right = None

    def predict_proba(self, X: np.ndarray) -> np.ndarray:
        X = np.asarray(X, dtype=np.float32)
        out = np.empty(len(X), dtype=np.float64)
        self._fill(self.root, X, np.arange(len(X)), out)
        return out

    def _fill(self, node, X, idx, out):
        if len(idx) == 0:
            return
        if node.is_leaf:
            out[idx] = node.prob
            return
        m = X[idx, node.feat] <= node.thresh
        self._fill(node.left, X, idx[m], out)
        self._fill(node.right, X, idx[~m], out)

    def n_leaves(self) -> int:
        def cnt(n):
            return 1 if n.is_leaf else cnt(n.left) + cnt(n.right)

        return cnt(self.root)


@dataclass
class RandomForest:
    """Bagged CART ensemble with sqrt-feature subsampling."""

    n_estimators: int = 16
    max_depth: int = 5
    ccp_alpha: float = 0.0
    min_weight_leaf: float = 1.0
    seed: int = 0
    trees: list = field(default_factory=list, repr=False)

    def fit(self, X: np.ndarray, y: np.ndarray, w: np.ndarray | None = None):
        X = np.asarray(X, dtype=np.float32)
        y = np.asarray(y, dtype=np.float64)
        n, m = X.shape
        w = np.ones(n) if w is None else np.asarray(w, dtype=np.float64)
        g = np.random.default_rng(self.seed)
        k = max(1, int(np.sqrt(m)))
        self.trees = []
        for b in range(self.n_estimators):
            # Row-level bootstrap over weighted rows: a weight-w row stands
            # for w identical samples, so its bootstrap count is Poisson(w)
            # (NOT w·Poisson(1), which would drop whole heavy vote patterns
            # from a tree and wreck minority-pattern memorization).
            boot = g.poisson(w).astype(np.float64)
            t = DecisionTree(
                max_depth=self.max_depth,
                ccp_alpha=self.ccp_alpha,
                min_weight_leaf=self.min_weight_leaf,
                max_features=k,
                seed=int(g.integers(0, 2**31)),
            )
            t.fit(X, y, boot)
            self.trees.append(t)
        return self

    def predict_proba(self, X: np.ndarray) -> np.ndarray:
        preds = np.stack([t.predict_proba(X) for t in self.trees])
        return preds.mean(axis=0)

    def predict(self, X: np.ndarray) -> np.ndarray:
        return (self.predict_proba(X) >= 0.5).astype(np.int8)
