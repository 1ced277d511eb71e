"""Random-search hyper-parameter tuning (paper §4.1 step 3, scaled).

The paper tunes with random search over 5-fold cross-validation; at our
scaled-down dataset sizes a stratified holdout split with a small number
of candidate draws preserves the protocol's structure (validation-score
driven selection, per-seed variation) at a fraction of the fits. The
number of candidates and the validation fraction live in the Protocol
preset so the paper-scale configuration remains expressible.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np

from repro.ml.metrics import metric_fn
from repro.ml.models import make_model, sample_params


@dataclass
class SearchResult:
    """Fitted best model plus its validation score and chosen params."""

    model: object
    val_score: float
    params: dict


def _stratified_holdout(y: np.ndarray, frac: float, rng: np.random.Generator):
    """Indices (train, val) of a stratified holdout split."""
    val_mask = np.zeros(y.size, dtype=bool)
    for cls in np.unique(y):
        idx = np.flatnonzero(y == cls)
        rng.shuffle(idx)
        n_val = max(1, int(round(frac * idx.size))) if idx.size > 1 else 0
        val_mask[idx[:n_val]] = True
    return np.flatnonzero(~val_mask), np.flatnonzero(val_mask)


def random_search(
    name: str,
    X: np.ndarray,
    y: np.ndarray,
    *,
    seed: int,
    n_candidates: int = 2,
    val_frac: float = 0.25,
    metric: str = "accuracy",
) -> SearchResult:
    """Tune ``name`` on (X, y); returns the refit best model.

    Candidates are drawn with a seed-specific RNG, scored on a
    stratified holdout, and the winner is refit on the full training
    matrix — its holdout score is the validation score used by the R2/R3
    selection steps.
    """
    rng = np.random.default_rng(seed)
    score = metric_fn(metric)
    tr, va = _stratified_holdout(y, val_frac, rng)
    best_params, best_val = None, -np.inf
    for _ in range(max(1, n_candidates)):
        params = sample_params(name, rng)
        if va.size == 0 or tr.size == 0:
            val = 0.0
        else:
            m = make_model(name, params, seed=seed).fit(X[tr], y[tr])
            val = score(y[va], m.predict(X[va]))
        if val > best_val:
            best_params, best_val = params, val
    model = make_model(name, best_params, seed=seed).fit(X, y)
    return SearchResult(model=model, val_score=float(best_val), params=best_params)
