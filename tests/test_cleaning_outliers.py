"""Outlier cleaning: SD/IQR/IF detection, repairs, Spark twins, oracle."""
import numpy as np
import pandas as pd
import pytest

from repro.cleaning.isolation_forest import IsolationForest, _c
from repro.cleaning.outliers import (
    detect_cells_pandas,
    detect_rows_pandas,
    fit_outlier_stats,
    fit_outlier_stats_spark,
    repair_pandas,
    repair_spark,
)
from repro.oracle import assert_equivalent


@pytest.fixture
def frame():
    rng = np.random.default_rng(0)
    a = rng.normal(10, 1, 200)
    a[:5] = [50.0, -40.0, 60.0, 55.0, -45.0]  # gross outliers
    b = rng.normal(0, 2, 200)
    return pd.DataFrame({"a": a, "b": b})


class TestSD:
    def test_bounds_formula(self, frame):
        s = fit_outlier_stats(frame, ["a"], "SD")
        mu, sd = frame.a.mean(), frame.a.std(ddof=0)
        assert s.bounds["a"][0] == pytest.approx(mu - 3 * sd)
        assert s.bounds["a"][1] == pytest.approx(mu + 3 * sd)

    def test_detects_planted(self, frame):
        s = fit_outlier_stats(frame, ["a"], "SD")
        mask = detect_cells_pandas(frame, s)
        assert mask.a[:5].all()

    def test_clean_column_untouched(self, frame):
        s = fit_outlier_stats(frame, ["a", "b"], "SD")
        mask = detect_cells_pandas(frame, s)
        assert mask.b.sum() <= 2  # ~3 sigma on normal data


class TestIQR:
    def test_bounds_formula(self, frame):
        s = fit_outlier_stats(frame, ["a"], "IQR")
        q1, q3 = frame.a.quantile(0.25), frame.a.quantile(0.75)
        iqr = q3 - q1
        assert s.bounds["a"][0] == pytest.approx(q1 - 1.5 * iqr)
        assert s.bounds["a"][1] == pytest.approx(q3 + 1.5 * iqr)

    def test_detects_planted(self, frame):
        s = fit_outlier_stats(frame, ["a"], "IQR")
        assert detect_cells_pandas(frame, s).a[:5].all()

    def test_row_mask_is_union(self, frame):
        s = fit_outlier_stats(frame, ["a", "b"], "IQR")
        cells = detect_cells_pandas(frame, s)
        rows = detect_rows_pandas(frame, s)
        assert rows.equals(cells.any(axis=1))


class TestIsolationForest:
    def test_c_formula(self):
        assert _c(1) == 0.0
        assert _c(2) > 0.0

    def test_anomalies_score_higher(self):
        rng = np.random.default_rng(1)
        X = rng.normal(0, 1, (300, 2))
        X[0] = [15.0, -15.0]
        f = IsolationForest(seed=0).fit(X)
        scores = f.score(X)
        assert scores[0] > np.median(scores)

    def test_contamination_rate(self):
        rng = np.random.default_rng(2)
        X = rng.normal(0, 1, (500, 3))
        f = IsolationForest(contamination=0.05, seed=0).fit(X)
        rate = f.predict_outlier(X).mean()
        assert 0.0 < rate <= 0.12

    def test_deterministic(self):
        rng = np.random.default_rng(3)
        X = rng.normal(0, 1, (200, 2))
        s1 = IsolationForest(seed=9).fit(X).score(X)
        s2 = IsolationForest(seed=9).fit(X).score(X)
        assert np.allclose(s1, s2)

    def test_detects_planted_in_frame(self, frame):
        # contamination=0.01 flags ~2 of 200 rows; those few flagged
        # rows must come from the planted gross outliers.
        s = fit_outlier_stats(frame, ["a", "b"], "IF", seed=0)
        rows = detect_rows_pandas(frame, s)
        assert 1 <= rows.sum() <= 6
        assert rows[:5].sum() >= 1
        assert rows[5:].sum() <= 1


class TestRepairs:
    @pytest.mark.parametrize("detect", ["SD", "IQR"])
    def test_delete_removes_flagged_rows(self, frame, detect):
        s = fit_outlier_stats(frame, ["a"], detect)
        out = repair_pandas(frame, s, "delete")
        assert len(out) == len(frame) - detect_rows_pandas(frame, s).sum()

    @pytest.mark.parametrize(
        "repair", ["impute_mean", "impute_median", "impute_mode"]
    )
    def test_impute_uses_inlier_stats(self, frame, repair):
        s = fit_outlier_stats(frame, ["a"], "SD")
        out = repair_pandas(frame, s, repair)
        fill = s.fill_value("a", repair)
        assert np.allclose(out.a[:5], fill)
        lo, hi = s.bounds["a"]
        assert lo <= fill <= hi  # fitted on inliers only

    def test_impute_keeps_inliers(self, frame):
        s = fit_outlier_stats(frame, ["a"], "IQR")
        out = repair_pandas(frame, s, "impute_mean")
        inl = ~detect_cells_pandas(frame, s).a
        assert np.allclose(out.a[inl], frame.a[inl])

    def test_if_repair_applies_to_whole_row(self, frame):
        s = fit_outlier_stats(frame, ["a", "b"], "IF", seed=0)
        out = repair_pandas(frame, s, "impute_median")
        rows = detect_rows_pandas(frame, s)
        assert np.allclose(out.a[rows], s.fill_median["a"])
        assert np.allclose(out.b[rows], s.fill_median["b"])

    def test_test_set_repaired_with_train_bounds(self, frame):
        s = fit_outlier_stats(frame, ["a"], "SD")
        test = pd.DataFrame({"a": [10.0, 500.0], "b": [0.0, 0.0]})
        out = repair_pandas(test, s, "impute_mean")
        assert out.a[0] == 10.0
        assert out.a[1] == pytest.approx(s.fill_mean["a"])


class TestSparkTwin:
    @pytest.mark.parametrize("detect", ["SD", "IQR"])
    def test_bounds_match_pandas(self, spark, frame, detect):
        s_pd = fit_outlier_stats(frame, ["a", "b"], detect)
        s_sp = fit_outlier_stats_spark(spark.createDataFrame(frame), ["a", "b"], detect)
        for c in ("a", "b"):
            assert s_sp.bounds[c][0] == pytest.approx(s_pd.bounds[c][0])
            assert s_sp.bounds[c][1] == pytest.approx(s_pd.bounds[c][1])
            assert s_sp.fill_mean[c] == pytest.approx(s_pd.fill_mean[c])
            assert s_sp.fill_median[c] == pytest.approx(s_pd.fill_median[c])

    def test_repair_matches_pandas(self, spark, frame):
        s = fit_outlier_stats(frame, ["a"], "IQR")
        got = (
            repair_spark(spark.createDataFrame(frame), s, "impute_mean")
            .toPandas()
            .sort_values(["a", "b"])
            .reset_index(drop=True)
        )
        want = (
            repair_pandas(frame, s, "impute_mean")
            .sort_values(["a", "b"])
            .reset_index(drop=True)
        )
        pd.testing.assert_frame_equal(got, want, check_dtype=False)

    def test_delete_against_oracle(self, spark, frame):
        s = fit_outlier_stats(frame, ["a"], "SD")
        lo, hi = s.bounds["a"]
        out = repair_spark(spark.createDataFrame(frame[["a"]]), s, "delete")
        assert_equivalent(
            out,
            f"SELECT a FROM t WHERE a >= {lo} AND a <= {hi}",
            t=frame[["a"]],
        )

    def test_impute_against_oracle(self, spark, frame):
        s = fit_outlier_stats(frame, ["a"], "IQR")
        lo, hi = s.bounds["a"]
        fill = s.fill_mean["a"]
        out = repair_spark(spark.createDataFrame(frame[["a"]]), s, "impute_mean")
        assert_equivalent(
            out,
            f"SELECT CASE WHEN a < {lo} OR a > {hi} THEN {fill} ELSE a END AS a FROM t",
            t=frame[["a"]],
        )

    def test_if_spark_raises(self, spark, frame):
        s = fit_outlier_stats(frame, ["a", "b"], "IF", seed=0)
        with pytest.raises(NotImplementedError):
            repair_spark(spark.createDataFrame(frame), s, "delete")
