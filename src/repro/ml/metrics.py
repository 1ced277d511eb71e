"""Binary classification metrics (paper §4.1: accuracy, or F1 for the
class-imbalanced datasets KDD and Credit)."""
import numpy as np


def accuracy(y_true, y_pred) -> float:
    """Fraction of correct predictions."""
    y_true = np.asarray(y_true)
    y_pred = np.asarray(y_pred)
    if y_true.size == 0:
        return 0.0
    return float((y_true == y_pred).mean())


def f1_binary(y_true, y_pred, positive: int = 1) -> float:
    """F1 score of the positive (minority) class; 0.0 when undefined."""
    y_true = np.asarray(y_true)
    y_pred = np.asarray(y_pred)
    tp = float(np.sum((y_true == positive) & (y_pred == positive)))
    fp = float(np.sum((y_true != positive) & (y_pred == positive)))
    fn = float(np.sum((y_true == positive) & (y_pred != positive)))
    denom = 2 * tp + fp + fn
    return 0.0 if denom == 0 else 2 * tp / denom


def metric_fn(name: str):
    """Look up a metric by name ('accuracy' or 'f1')."""
    if name == "accuracy":
        return accuracy
    if name == "f1":
        return f1_binary
    raise KeyError(f"unknown metric {name!r}")
