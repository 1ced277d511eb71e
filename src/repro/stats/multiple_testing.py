"""Benjamini-Yekutieli FDR control (CleanML §4.3).

The BY step-up procedure controls the false discovery rate under
arbitrary dependence by comparing the k-th smallest p-value against
k * alpha / (m * c(m)) with c(m) = sum_{i=1..m} 1/i. We expose it as
*adjusted p-values* so the downstream flag rule can keep comparing
against a fixed alpha: reject H_(k) iff adjusted p_(k) <= alpha.
"""
import numpy as np


def by_adjust(pvals) -> np.ndarray:
    """Return BY-adjusted p-values, in the input order.

    adjusted p_(k) = min_{j >= k} ( m * c(m) * p_(j) / j ), capped at 1,
    computed over the ascending order statistics and mapped back.
    """
    p = np.asarray(pvals, dtype=np.float64)
    if p.ndim != 1:
        raise ValueError("pvals must be one-dimensional")
    m = p.size
    if m == 0:
        return p.copy()
    if np.any((p < 0) | (p > 1) | np.isnan(p)):
        raise ValueError("p-values must be in [0, 1] and non-NaN")
    c_m = float(np.sum(1.0 / np.arange(1, m + 1)))
    order = np.argsort(p, kind="stable")
    ranked = p[order] * m * c_m / np.arange(1, m + 1)
    # Step-up: running minimum from the largest rank downwards.
    adjusted = np.minimum.accumulate(ranked[::-1])[::-1]
    adjusted = np.minimum(adjusted, 1.0)
    out = np.empty(m, dtype=np.float64)
    out[order] = adjusted
    return out
