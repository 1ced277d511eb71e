"""Demonstrate the Spark-native path end to end on one dataset:
cleaning as DataFrame transforms feeding an MLlib pipeline.

    spark-submit jobs/mllib_pipeline_demo.py [--dataset EEG] [--model logistic_regression]

Loads the (synthetic) EEG dataset as a Spark DataFrame, repairs its
outliers with the Spark IQR/mean-imputation transform (statistics from
the training split only), trains the chosen MLlib pipeline on dirty
and cleaned training data, and prints the scenario-BD accuracy pair.
"""
import argparse
import os
import sys

sys.path.insert(0, os.path.join(os.path.dirname(__file__), "..", "src"))


def main(spark, dataset: str = "EEG", model: str = "logistic_regression") -> dict:
    from pyspark.sql import functions as F

    from repro.cleaning.outliers import fit_outlier_stats_spark, repair_spark
    from repro.datasets.registry import load_dataset, spec_for
    from repro.ml.mllib import LABEL, fit_and_predict

    spec = spec_for(dataset)
    sdf = spark.createDataFrame(load_dataset(dataset)).withColumn(
        "__id", F.monotonically_increasing_id()
    )
    train, test = sdf.randomSplit([0.7, 0.3], seed=7)

    stats = fit_outlier_stats_spark(train, list(spec.numeric), "IQR")
    train_clean = repair_spark(train, stats, "impute_mean")
    test_clean = repair_spark(test, stats, "impute_mean")

    def acc(pred_df) -> float:
        agg = pred_df.agg(
            F.avg((F.col("prediction") == F.col(LABEL)).cast("double")).alias("acc")
        ).collect()[0]
        return float(agg["acc"])

    dirty_pred = fit_and_predict(model, spec, train, test_clean)
    clean_pred = fit_and_predict(model, spec, train_clean, test_clean)
    pair = (acc(dirty_pred), acc(clean_pred))
    print(
        f"dataset={dataset} model={model} scenario=BD metric pair "
        f"(dirty-trained, clean-trained) = ({pair[0]:.4f}, {pair[1]:.4f})"
    )
    return {"pair": pair}


if __name__ == "__main__":
    ap = argparse.ArgumentParser()
    ap.add_argument("--dataset", default="EEG")
    ap.add_argument("--model", default="logistic_regression")
    args = ap.parse_args()
    from pyspark.sql import SparkSession

    spark = (
        SparkSession.builder.appName("cleanml-mllib-demo")
        .config("spark.sql.shuffle.partitions", "16")
        .getOrCreate()
    )
    main(spark, args.dataset, args.model)
    spark.stop()
