"""Build the CleanML relations R1/R2/R3 from the results DataFrame.

The pipeline is Spark-native end to end:

1. **Metric pairs** per (spec, split) are assembled with joins between
   the "before" and "after" slices of the results DataFrame (Table 4/5
   semantics, per scenario).
2. **Seed aggregation** (§4.2.1): R1 averages both sides over the
   random-search seeds; R2/R3 select the best (model, seed) by
   validation metric via window functions.
3. **Cleaning-method selection** for R3 (§4.1) picks the method whose
   selected clean-side model has the best validation metric.
4. **t-tests** (§4.2.2) run per spec over its split pairs with
   ``applyInPandas``; the **BY correction** (§4.3) runs per relation
   and test type, and flags follow the paper's decision rule.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import DataFrame, Window
from pyspark.sql import functions as F
from pyspark.sql import types as T

from repro.core.schema import baseline_for, scenarios_for
from repro.stats import by_adjust, decide_flag, paired_ttest

_PAIR_KEY = ["dataset", "error_type", "detect", "repair", "model", "scenario"]


def _method_rows(results: DataFrame) -> DataFrame:
    """Rows of models trained on a cleaned training version."""
    baseline = F.when(
        F.col("error_type") == "missing_values", F.lit("delete")
    ).otherwise(F.lit("dirty"))
    return results.where(F.col("train_version") != baseline)


def build_pairs_r1(results: DataFrame) -> DataFrame:
    """R1 metric pairs: seed-averaged (before, after) per spec and split.

    BD: before = baseline-trained model on the cleaned test variant,
        after = clean-trained model on the same variant.
    CD: before = clean-trained model on the dirty test set,
        after = the same model on its cleaned test variant.
    """
    method = _method_rows(results)
    after = method.where(F.col("test_variant") == F.col("train_version"))
    after_g = after.groupBy(
        *_PAIR_KEY[:4], "train_version", "model", "split_seed"
    ).agg(F.avg("test_metric").alias("after_metric"))

    baseline = F.when(
        F.col("error_type") == "missing_values", F.lit("delete")
    ).otherwise(F.lit("dirty"))
    before_bd = (
        results.where(F.col("train_version") == baseline)
        .where(F.col("test_variant") != "dirty")
        .groupBy("dataset", "error_type", "model", "split_seed", "test_variant")
        .agg(F.avg("test_metric").alias("before_metric"))
    )
    bd = (
        after_g.alias("a")
        .join(
            before_bd.alias("b"),
            on=[
                F.col("a.dataset") == F.col("b.dataset"),
                F.col("a.error_type") == F.col("b.error_type"),
                F.col("a.model") == F.col("b.model"),
                F.col("a.split_seed") == F.col("b.split_seed"),
                F.col("b.test_variant") == F.col("a.train_version"),
            ],
        )
        .select("a.*", "b.before_metric")
        .withColumn("scenario", F.lit("BD"))
    )

    before_cd = (
        method.where(F.col("test_variant") == "dirty")
        .groupBy(*_PAIR_KEY[:4], "train_version", "model", "split_seed")
        .agg(F.avg("test_metric").alias("before_metric"))
    )
    cd = (
        after_g.join(
            before_cd,
            on=[*_PAIR_KEY[:4], "model", "split_seed", "train_version"],
        )
        .withColumn("scenario", F.lit("CD"))
        .where(F.col("error_type") != "missing_values")
    )
    cols = [*_PAIR_KEY[:4], "train_version", "model", "scenario", "split_seed",
            "before_metric", "after_metric"]
    return bd.select(*cols).unionByName(cd.select(*cols))


def build_pairs_r2(results: DataFrame) -> DataFrame:
    """R2 metric pairs: per split, pick the best (model, seed) on each
    side by validation metric (§4.2.1 / Table 8, 11)."""
    method = _method_rows(results)
    after = method.where(F.col("test_variant") == F.col("train_version"))
    w_after = Window.partitionBy(
        "dataset", "error_type", "detect", "repair", "train_version", "split_seed"
    ).orderBy(F.desc("val_metric"), F.asc("model"), F.asc("search_seed"))
    after_best = (
        after.withColumn("__rn", F.row_number().over(w_after))
        .where(F.col("__rn") == 1)
        .select(
            *_PAIR_KEY[:4],
            "train_version",
            "split_seed",
            F.col("test_metric").alias("after_metric"),
            F.col("val_metric").alias("after_val"),
        )
    )

    baseline = F.when(
        F.col("error_type") == "missing_values", F.lit("delete")
    ).otherwise(F.lit("dirty"))
    before_bd_rows = results.where(F.col("train_version") == baseline).where(
        F.col("test_variant") != "dirty"
    )
    w_bd = Window.partitionBy(
        "dataset", "error_type", "test_variant", "split_seed"
    ).orderBy(F.desc("val_metric"), F.asc("model"), F.asc("search_seed"))
    before_bd = (
        before_bd_rows.withColumn("__rn", F.row_number().over(w_bd))
        .where(F.col("__rn") == 1)
        .select(
            "dataset",
            "error_type",
            "split_seed",
            "test_variant",
            F.col("test_metric").alias("before_metric"),
        )
    )
    bd = (
        after_best.alias("a")
        .join(
            before_bd.alias("b"),
            on=[
                F.col("a.dataset") == F.col("b.dataset"),
                F.col("a.error_type") == F.col("b.error_type"),
                F.col("a.split_seed") == F.col("b.split_seed"),
                F.col("b.test_variant") == F.col("a.train_version"),
            ],
        )
        .select("a.*", "b.before_metric")
        .withColumn("scenario", F.lit("BD"))
    )

    # CD: the clean-side selected model, scored on the dirty variant.
    before_cd_rows = method.where(F.col("test_variant") == "dirty")
    before_cd = (
        before_cd_rows.withColumn("__rn", F.row_number().over(w_after))
        .where(F.col("__rn") == 1)
        .select(
            *_PAIR_KEY[:4],
            "train_version",
            "split_seed",
            F.col("test_metric").alias("before_metric"),
        )
    )
    cd = (
        after_best.join(
            before_cd,
            on=[*_PAIR_KEY[:4], "train_version", "split_seed"],
        )
        .withColumn("scenario", F.lit("CD"))
        .where(F.col("error_type") != "missing_values")
    )
    cols = [*_PAIR_KEY[:4], "train_version", "scenario", "split_seed",
            "before_metric", "after_metric", "after_val"]
    return bd.select(*cols).unionByName(cd.select(*cols))


def build_pairs_r3(pairs_r2: DataFrame) -> DataFrame:
    """R3 pairs: per (dataset, error, scenario, split) keep the cleaning
    method whose clean-side validation metric is best (Table 9)."""
    w = Window.partitionBy("dataset", "error_type", "scenario", "split_seed").orderBy(
        F.desc("after_val"), F.asc("detect"), F.asc("repair")
    )
    return (
        pairs_r2.withColumn("__rn", F.row_number().over(w))
        .where(F.col("__rn") == 1)
        .drop("__rn")
    )


_TTEST_SCHEMA_EXTRA = [
    T.StructField("n_pairs", T.IntegerType()),
    T.StructField("mean_before", T.DoubleType()),
    T.StructField("mean_after", T.DoubleType()),
    T.StructField("mean_diff", T.DoubleType()),
    T.StructField("p_two", T.DoubleType()),
    T.StructField("p_upper", T.DoubleType()),
    T.StructField("p_lower", T.DoubleType()),
]


def _ttest_over_splits(pairs: DataFrame, key: list[str]) -> pd.DataFrame:
    """Collect each spec's split pairs and run the three t-tests."""
    schema = T.StructType(
        [T.StructField(k, T.StringType()) for k in key] + _TTEST_SCHEMA_EXTRA
    )

    def _test(keyvals, pdf):
        res = paired_ttest(pdf["before_metric"], pdf["after_metric"])
        row = {k: v for k, v in zip(key, keyvals)}
        row.update(
            n_pairs=int(res.n),
            mean_before=float(pdf["before_metric"].mean()),
            mean_after=float(pdf["after_metric"].mean()),
            mean_diff=res.mean_diff,
            p_two=res.p_two,
            p_upper=res.p_upper,
            p_lower=res.p_lower,
        )
        return pd.DataFrame([row])

    tested = pairs.groupBy(*key).applyInPandas(_test, schema=schema)
    return tested.toPandas()


def _apply_by_and_flags(tested: pd.DataFrame, alpha: float) -> pd.DataFrame:
    """BY-adjust each test type across the relation, then flag."""
    out = tested.copy()
    for col in ("p_two", "p_upper", "p_lower"):
        out[f"{col}_adj"] = by_adjust(out[col].to_numpy()) if len(out) else []
    out["flag"] = [
        decide_flag(r.p_two_adj, r.p_upper_adj, r.p_lower_adj, alpha).value
        for r in out.itertuples()
    ]
    return out


def build_relations(results: DataFrame, alpha: float = 0.05) -> dict[str, pd.DataFrame]:
    """Full §4 pipeline: results -> flagged R1, R2, R3 (as pandas)."""
    pairs_r1 = build_pairs_r1(results)
    pairs_r2 = build_pairs_r2(results)
    pairs_r3 = build_pairs_r3(pairs_r2)
    r1 = _apply_by_and_flags(
        _ttest_over_splits(
            pairs_r1, ["dataset", "error_type", "detect", "repair", "model", "scenario"]
        ),
        alpha,
    )
    r2 = _apply_by_and_flags(
        _ttest_over_splits(
            pairs_r2, ["dataset", "error_type", "detect", "repair", "scenario"]
        ),
        alpha,
    )
    r3 = _apply_by_and_flags(
        _ttest_over_splits(pairs_r3, ["dataset", "error_type", "scenario"]), alpha
    )
    return {"R1": r1, "R2": r2, "R3": r3}
