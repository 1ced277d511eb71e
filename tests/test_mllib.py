"""MLlib backend tests: Spark feature pipeline, all seven models as
pipeline stages (incl. custom KNN/AdaBoost), and cross-backend
agreement with the NumPy implementations."""
import numpy as np
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.datasets import load_dataset, spec_for
from repro.datasets.base import DatasetSpec
from repro.ml.mllib import (
    FEATURES,
    LABEL,
    AdaBoostClassifier,
    KNNClassifier,
    build_feature_pipeline,
    fit_and_predict,
    make_estimator,
    prepare,
)

pytestmark = pytest.mark.mllib


@pytest.fixture(scope="module")
def toy_spec():
    return DatasetSpec(
        name="toy", label="y", numeric=("a", "b"), categorical=("c",), text=()
    )


@pytest.fixture(scope="module")
def toy(spark, toy_spec):
    rng = np.random.default_rng(0)
    n = 300
    a = rng.normal(size=n)
    b = rng.normal(size=n)
    c = rng.choice(["u", "v"], n)
    y = ((a + 0.5 * b + (c == "u") * 0.8) > 0.4).astype(int)
    pdf = pd.DataFrame({"a": a, "b": b, "c": c, "y": y})
    sdf = spark.createDataFrame(pdf)
    return sdf.randomSplit([0.7, 0.3], seed=1)


def _acc(pred_df) -> float:
    row = pred_df.agg(
        F.avg((F.col("prediction") == F.col(LABEL)).cast("double")).alias("acc")
    ).collect()[0]
    return float(row["acc"])


class TestFeaturePipeline:
    def test_produces_features_vector(self, spark, toy, toy_spec):
        train, _ = toy
        prepared = prepare(train, toy_spec)
        out = build_feature_pipeline(toy_spec).fit(prepared).transform(prepared)
        row = out.select(FEATURES).first()
        # 2 numerics + one-hot over {u, v} (+keep bucket) = 2 + 3.
        assert len(row[FEATURES]) == 5

    def test_handles_null_numeric(self, spark, toy_spec):
        pdf = pd.DataFrame(
            {"a": [1.0, None, 3.0], "b": [1.0, 2.0, 3.0], "c": ["u", "v", "u"], "y": [0, 1, 0]}
        )
        prepared = prepare(spark.createDataFrame(pdf), toy_spec)
        out = build_feature_pipeline(toy_spec).fit(prepared).transform(prepared)
        assert out.count() == 3

    def test_text_pipeline(self, spark):
        spec = DatasetSpec(name="t", label="y", text=("doc",))
        pdf = pd.DataFrame({"doc": ["red fox", "blue dog", "red dog"], "y": [1, 0, 0]})
        prepared = prepare(spark.createDataFrame(pdf), spec)
        out = build_feature_pipeline(spec).fit(prepared).transform(prepared)
        assert len(out.select(FEATURES).first()[FEATURES]) == 32


@pytest.mark.parametrize(
    "name",
    [
        "logistic_regression",
        "decision_tree",
        "random_forest",
        "xgboost",
        "naive_bayes",
        "knn",
        "adaboost",
    ],
)
class TestSevenModels:
    def test_learns_toy(self, spark, toy, toy_spec, name):
        train, test = toy
        pred = fit_and_predict(name, toy_spec, train, test, seed=0)
        assert _acc(pred) > 0.75, name


class TestCustomStages:
    def test_knn_k1_memorizes_train(self, spark, toy, toy_spec):
        train, _ = toy
        prepared = prepare(train, toy_spec)
        feat = build_feature_pipeline(toy_spec).fit(prepared)
        train_f = feat.transform(prepared)
        knn = KNNClassifier(k=1).fit(train_f)
        assert _acc(knn.transform(train_f)) == 1.0

    def test_adaboost_stages_recorded(self, spark, toy, toy_spec):
        train, _ = toy
        prepared = prepare(train, toy_spec)
        train_f = build_feature_pipeline(toy_spec).fit(prepared).transform(prepared)
        ab = AdaBoostClassifier(n_estimators=3, max_depth=1).fit(train_f)
        assert 1 <= len(ab.stages_) <= 3
        assert all(alpha > 0 for _, alpha in ab.stages_)

    def test_unknown_estimator(self):
        with pytest.raises(KeyError):
            make_estimator("svm")


class TestCrossBackend:
    """Both backends must see the same qualitative picture on EEG."""

    def test_mllib_agrees_with_numpy_on_cleaning_gain(self, spark):
        from repro.cleaning.outliers import fit_outlier_stats, repair_pandas
        from repro.core.runner import split_frame
        from repro.ml.features import Featurizer
        from repro.ml.metrics import accuracy
        from repro.ml.models import make_model

        spec = spec_for("EEG")
        pdf = load_dataset("EEG")
        train, test = split_frame(pdf, 11, 0.3)
        stats = fit_outlier_stats(train, list(spec.numeric), "IQR")
        train_c = repair_pandas(train, stats, "impute_mean")
        test_c = repair_pandas(test, stats, "impute_mean")

        # NumPy backend pair.
        feat_d = Featurizer(numeric=list(spec.numeric)).fit(train)
        feat_c = Featurizer(numeric=list(spec.numeric)).fit(train_c)
        yd = train[spec.label].to_numpy()
        yc = train_c[spec.label].to_numpy()
        yt = test_c[spec.label].to_numpy()
        m_dirty = make_model("logistic_regression").fit(feat_d.transform(train), yd)
        m_clean = make_model("logistic_regression").fit(feat_c.transform(train_c), yc)
        np_pair = (
            accuracy(yt, m_dirty.predict(feat_d.transform(test_c))),
            accuracy(yt, m_clean.predict(feat_c.transform(test_c))),
        )

        # MLlib backend pair on the same frames.
        sp_train = spark.createDataFrame(train)
        sp_train_c = spark.createDataFrame(train_c)
        sp_test_c = spark.createDataFrame(test_c)
        ml_pair = (
            _acc(fit_and_predict("logistic_regression", spec, sp_train, sp_test_c)),
            _acc(fit_and_predict("logistic_regression", spec, sp_train_c, sp_test_c)),
        )
        # Same direction (cleaning helps) and close absolute values.
        assert np_pair[1] > np_pair[0]
        assert ml_pair[1] > ml_pair[0]
        assert abs(np_pair[0] - ml_pair[0]) < 0.08
        assert abs(np_pair[1] - ml_pair[1]) < 0.08
