"""Numerical-outlier detection and repair (paper §3.1.2).

Detectors:

* **SD** — cell is an outlier if more than 3 standard deviations from
  the column mean,
* **IQR** — cell outside [Q1 - 1.5 IQR, Q3 + 1.5 IQR],
* **IF** — isolation forest over the numeric columns (contamination
  0.01); flags whole rows, and repairs apply to every numeric cell of a
  flagged row.

Repairs: delete flagged rows, or impute flagged cells with the mean /
median / mode of the *inlier* training values of the column. All
statistics (bounds, forest, repair values) are fitted on the training
set only.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.cleaning.isolation_forest import IsolationForest

SD_N = 3.0
IQR_K = 1.5
IF_CONTAMINATION = 0.01


@dataclass
class OutlierStats:
    """Fitted detection bounds / forest plus inlier repair values."""

    detect: str
    bounds: dict = field(default_factory=dict)  # col -> (lo, hi), SD/IQR
    forest: IsolationForest | None = None
    fill_mean: dict = field(default_factory=dict)
    fill_median: dict = field(default_factory=dict)
    fill_mode: dict = field(default_factory=dict)
    numeric: list = field(default_factory=list)

    def fill_value(self, col: str, repair: str) -> float:
        return {
            "impute_mean": self.fill_mean,
            "impute_median": self.fill_median,
            "impute_mode": self.fill_mode,
        }[repair][col]


def _numeric_matrix(pdf: pd.DataFrame, numeric: list[str]) -> np.ndarray:
    X = pdf[numeric].apply(pd.to_numeric, errors="coerce").to_numpy(dtype=np.float64)
    if np.isnan(X).any():
        med = np.nanmedian(X, axis=0)
        X = np.where(np.isnan(X), np.where(np.isnan(med), 0.0, med), X)
    return X


def fit_outlier_stats(
    train: pd.DataFrame, numeric: list[str], detect: str, *, seed: int = 0
) -> OutlierStats:
    """Fit bounds (SD/IQR) or the isolation forest (IF) on the train set."""
    stats = OutlierStats(detect=detect, numeric=list(numeric))
    if detect in ("SD", "IQR"):
        for c in numeric:
            col = pd.to_numeric(train[c], errors="coerce").dropna()
            if col.empty:
                stats.bounds[c] = (-np.inf, np.inf)
                continue
            if detect == "SD":
                mu, sd = float(col.mean()), float(col.std(ddof=0))
                stats.bounds[c] = (mu - SD_N * sd, mu + SD_N * sd)
            else:
                q1, q3 = float(col.quantile(0.25)), float(col.quantile(0.75))
                iqr = q3 - q1
                stats.bounds[c] = (q1 - IQR_K * iqr, q3 + IQR_K * iqr)
    elif detect == "IF":
        X = _numeric_matrix(train, numeric)
        stats.forest = IsolationForest(contamination=IF_CONTAMINATION, seed=seed).fit(X)
    else:
        raise KeyError(f"unknown detector {detect!r}")
    cell_mask = detect_cells_pandas(train, stats)
    for c in numeric:
        col = pd.to_numeric(train[c], errors="coerce")
        inlier = col[~cell_mask[c] & col.notna()]
        if inlier.empty:
            inlier = col.dropna()
        if inlier.empty:
            stats.fill_mean[c] = stats.fill_median[c] = stats.fill_mode[c] = 0.0
        else:
            stats.fill_mean[c] = float(inlier.mean())
            stats.fill_median[c] = float(inlier.median())
            stats.fill_mode[c] = float(inlier.mode().iloc[0])
    return stats


def detect_cells_pandas(pdf: pd.DataFrame, stats: OutlierStats) -> pd.DataFrame:
    """Boolean mask frame over the numeric columns: True = outlier cell."""
    mask = pd.DataFrame(False, index=pdf.index, columns=stats.numeric)
    if stats.detect in ("SD", "IQR"):
        for c in stats.numeric:
            lo, hi = stats.bounds[c]
            col = pd.to_numeric(pdf[c], errors="coerce")
            mask[c] = (col < lo) | (col > hi)
    else:
        rows = stats.forest.predict_outlier(_numeric_matrix(pdf, stats.numeric))
        for c in stats.numeric:
            mask[c] = rows
    return mask


def detect_rows_pandas(pdf: pd.DataFrame, stats: OutlierStats) -> pd.Series:
    """Boolean row mask: row contains at least one outlier cell."""
    return detect_cells_pandas(pdf, stats).any(axis=1)


def repair_pandas(pdf: pd.DataFrame, stats: OutlierStats, repair: str) -> pd.DataFrame:
    """Apply one of Table 2's outlier repairs."""
    if repair == "delete":
        return pdf[~detect_rows_pandas(pdf, stats)].reset_index(drop=True)
    mask = detect_cells_pandas(pdf, stats)
    out = pdf.copy()
    for c in stats.numeric:
        col = pd.to_numeric(out[c], errors="coerce")
        out[c] = col.mask(mask[c], stats.fill_value(c, repair))
    return out


def fit_outlier_stats_spark(
    train: DataFrame, numeric: list[str], detect: str, *, seed: int = 0
) -> OutlierStats:
    """Spark-native fit for SD/IQR bounds (IF fits its forest on a
    driver-collected numeric matrix — the forest subsamples 256 rows)."""
    if detect == "IF":
        return fit_outlier_stats(
            train.select(*numeric).toPandas(), numeric, detect, seed=seed
        )
    stats = OutlierStats(detect=detect, numeric=list(numeric))
    aggs = []
    for c in numeric:
        if detect == "SD":
            aggs += [
                F.avg(c).alias(f"{c}__mu"),
                F.stddev_pop(c).alias(f"{c}__sd"),
            ]
        else:
            aggs += [
                F.expr(f"percentile(`{c}`, 0.25)").alias(f"{c}__q1"),
                F.expr(f"percentile(`{c}`, 0.75)").alias(f"{c}__q3"),
            ]
    row = train.agg(*aggs).collect()[0]
    for c in numeric:
        if detect == "SD":
            mu, sd = float(row[f"{c}__mu"]), float(row[f"{c}__sd"] or 0.0)
            stats.bounds[c] = (mu - SD_N * sd, mu + SD_N * sd)
        else:
            q1, q3 = float(row[f"{c}__q1"]), float(row[f"{c}__q3"])
            iqr = q3 - q1
            stats.bounds[c] = (q1 - IQR_K * iqr, q3 + IQR_K * iqr)
    # Inlier repair statistics via a second Spark aggregation pass.
    inlier_aggs = []
    for c in numeric:
        lo, hi = stats.bounds[c]
        inl = F.when((F.col(c) >= lo) & (F.col(c) <= hi), F.col(c))
        inlier_aggs += [
            F.avg(inl).alias(f"{c}__mean"),
            F.expr(
                f"percentile(CASE WHEN `{c}` >= {lo} AND `{c}` <= {hi} "
                f"THEN `{c}` END, 0.5)"
            ).alias(f"{c}__median"),
        ]
    row2 = train.agg(*inlier_aggs).collect()[0]
    for c in numeric:
        lo, hi = stats.bounds[c]
        stats.fill_mean[c] = float(row2[f"{c}__mean"] or 0.0)
        stats.fill_median[c] = float(row2[f"{c}__median"] or 0.0)
        mode_rows = (
            train.where((F.col(c) >= lo) & (F.col(c) <= hi))
            .groupBy(c)
            .count()
            .orderBy(F.desc("count"), F.asc(c))
            .limit(1)
            .collect()
        )
        stats.fill_mode[c] = float(mode_rows[0][0]) if mode_rows else 0.0
    return stats


def _outlier_cond(c: str, stats: OutlierStats):
    lo, hi = stats.bounds[c]
    return (F.col(c) < lo) | (F.col(c) > hi)


def repair_spark(sdf: DataFrame, stats: OutlierStats, repair: str) -> DataFrame:
    """Spark transform of the SD/IQR repairs (IF repairs go through the
    pandas twin inside tasks; its per-row scoring is model-based)."""
    if stats.detect == "IF":
        raise NotImplementedError("IF repair is provided by the pandas twin")
    if repair == "delete":
        cond = None
        for c in stats.numeric:
            oc = _outlier_cond(c, stats)
            cond = oc if cond is None else (cond | oc)
        return sdf if cond is None else sdf.where(~cond)
    out = sdf
    for c in stats.numeric:
        fill = F.lit(stats.fill_value(c, repair))
        out = out.withColumn(
            c,
            F.when(_outlier_cond(c, stats), fill).otherwise(F.col(c).cast("double")),
        )
    return out
