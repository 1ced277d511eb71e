"""Histogram-based CART used by every tree model in the NumPy backend.

Features are pre-binned into at most 32 quantile bins (fitted on the
training matrix), after which split finding is a vectorized cumulative
sum over per-bin class/gradient histograms. Supports:

* weighted Gini classification trees (DecisionTree, RandomForest,
  AdaBoost base learners), and
* second-order "Newton" regression trees on gradient/hessian pairs
  (the XGBoost-lite booster).
"""
from __future__ import annotations

import numpy as np

N_BINS = 32


class Binner:
    """Quantile binning fitted on train data; maps floats to uint8 bins."""

    def __init__(self, n_bins: int = N_BINS):
        self.n_bins = n_bins
        self.edges_: list[np.ndarray] = []

    def fit(self, X: np.ndarray) -> "Binner":
        self.edges_ = []
        qs = np.linspace(0, 1, self.n_bins + 1)[1:-1]
        for j in range(X.shape[1]):
            col = X[:, j]
            edges = np.unique(np.quantile(col, qs))
            self.edges_.append(edges)
        return self

    def transform(self, X: np.ndarray) -> np.ndarray:
        B = np.empty(X.shape, dtype=np.uint8)
        for j, edges in enumerate(self.edges_):
            B[:, j] = np.searchsorted(edges, X[:, j], side="right")
        return B

    def fit_transform(self, X: np.ndarray) -> np.ndarray:
        return self.fit(X).transform(X)


def _leaf(value: float) -> dict:
    return {"leaf": float(value)}


def _gini_best_split(
    B: np.ndarray,
    y: np.ndarray,
    w: np.ndarray,
    idx: np.ndarray,
    features: np.ndarray,
    n_bins: int,
    min_leaf: int,
):
    """Best (feature, bin-threshold) by weighted Gini over ``idx`` rows.

    Returns (score, feat, thr) with score = weighted child impurity;
    feat is None when no valid split exists.
    """
    yb = y[idx]
    wb = w[idx]
    n = idx.size
    best = (np.inf, None, -1)
    for f in features:
        code = B[idx, f].astype(np.int64) * 2 + yb
        hist = np.bincount(code, weights=wb, minlength=n_bins * 2).reshape(n_bins, 2)
        cnt = np.bincount(B[idx, f].astype(np.int64), minlength=n_bins)
        cum = np.cumsum(hist, axis=0)[:-1]  # left side for thr = bin index
        cnt_l = np.cumsum(cnt)[:-1]
        tot = hist.sum(axis=0)
        wl = cum.sum(axis=1)
        wr = tot.sum() - wl
        valid = (cnt_l >= min_leaf) & ((n - cnt_l) >= min_leaf) & (wl > 0) & (wr > 0)
        if not valid.any():
            continue
        with np.errstate(divide="ignore", invalid="ignore"):
            gini_l = 1.0 - ((cum / wl[:, None]) ** 2).sum(axis=1)
            right = tot[None, :] - cum
            gini_r = 1.0 - ((right / wr[:, None]) ** 2).sum(axis=1)
            score = (wl * gini_l + wr * gini_r) / tot.sum()
        score = np.where(valid, score, np.inf)
        t = int(np.argmin(score))
        if score[t] < best[0]:
            best = (float(score[t]), int(f), t)
    return best


def fit_tree_classifier(
    B: np.ndarray,
    y: np.ndarray,
    w: np.ndarray | None = None,
    *,
    max_depth: int = 6,
    min_leaf: int = 2,
    n_bins: int = N_BINS,
    max_features: int | None = None,
    rng: np.random.Generator | None = None,
) -> dict:
    """Grow a binary-classification CART on pre-binned features.

    Leaves store the weighted probability of class 1. ``max_features``
    (with ``rng``) samples a feature subset per node for random forests.
    """
    y = np.asarray(y, dtype=np.int64)
    w = np.ones(y.size, dtype=np.float64) if w is None else np.asarray(w, np.float64)
    d = B.shape[1]

    def grow(idx: np.ndarray, depth: int) -> dict:
        wb = w[idx]
        p1 = float((wb * y[idx]).sum() / wb.sum()) if wb.sum() > 0 else 0.5
        if depth >= max_depth or idx.size < 2 * min_leaf or p1 in (0.0, 1.0):
            return _leaf(p1)
        if max_features is not None and max_features < d:
            features = rng.choice(d, size=max_features, replace=False)
        else:
            features = np.arange(d)
        parent = 2.0 * p1 * (1.0 - p1)
        score, feat, thr = _gini_best_split(B, y, w, idx, features, n_bins, min_leaf)
        if feat is None or parent - score < 1e-12:
            return _leaf(p1)
        mask = B[idx, feat] <= thr
        return {
            "feat": feat,
            "thr": thr,
            "left": grow(idx[mask], depth + 1),
            "right": grow(idx[~mask], depth + 1),
        }

    return grow(np.arange(B.shape[0]), 0)


def fit_tree_newton(
    B: np.ndarray,
    grad: np.ndarray,
    hess: np.ndarray,
    *,
    max_depth: int = 4,
    min_leaf: int = 5,
    lam: float = 1.0,
    n_bins: int = N_BINS,
) -> dict:
    """Grow a regression tree with XGBoost-style second-order leaf values.

    Split gain is the standard 0.5 * (GL^2/(HL+lam) + GR^2/(HR+lam)
    - G^2/(H+lam)); leaf weight is -G/(H+lam).
    """
    d = B.shape[1]

    def grow(idx: np.ndarray, depth: int) -> dict:
        G = float(grad[idx].sum())
        H = float(hess[idx].sum())
        value = -G / (H + lam)
        if depth >= max_depth or idx.size < 2 * min_leaf:
            return _leaf(value)
        best = (1e-12, None, -1)
        base = G * G / (H + lam)
        for f in range(d):
            code = B[idx, f].astype(np.int64)
            hg = np.bincount(code, weights=grad[idx], minlength=n_bins)
            hh = np.bincount(code, weights=hess[idx], minlength=n_bins)
            cnt = np.bincount(code, minlength=n_bins)
            GL = np.cumsum(hg)[:-1]
            HL = np.cumsum(hh)[:-1]
            cnt_l = np.cumsum(cnt)[:-1]
            valid = (cnt_l >= min_leaf) & ((idx.size - cnt_l) >= min_leaf)
            if not valid.any():
                continue
            gain = GL**2 / (HL + lam) + (G - GL) ** 2 / (H - HL + lam) - base
            gain = np.where(valid, gain, -np.inf)
            t = int(np.argmax(gain))
            if gain[t] > best[0]:
                best = (float(gain[t]), int(f), t)
        _, feat, thr = best
        if feat is None:
            return _leaf(value)
        mask = B[idx, feat] <= thr
        return {
            "feat": feat,
            "thr": thr,
            "left": grow(idx[mask], depth + 1),
            "right": grow(idx[~mask], depth + 1),
        }

    return grow(np.arange(B.shape[0]), 0)


def tree_apply(node: dict, B: np.ndarray) -> np.ndarray:
    """Vectorized tree evaluation on pre-binned features -> leaf values."""
    out = np.empty(B.shape[0], dtype=np.float64)

    def descend(nd: dict, idx: np.ndarray) -> None:
        if "leaf" in nd:
            out[idx] = nd["leaf"]
            return
        mask = B[idx, nd["feat"]] <= nd["thr"]
        if mask.any():
            descend(nd["left"], idx[mask])
        if (~mask).any():
            descend(nd["right"], idx[~mask])

    descend(node, np.arange(B.shape[0]))
    return out


def tree_depth(node: dict) -> int:
    """Depth of the tree (a lone leaf has depth 0)."""
    if "leaf" in node:
        return 0
    return 1 + max(tree_depth(node["left"]), tree_depth(node["right"]))
