"""pytest-benchmark targets, one per paper table (see DESIGN.md §4).

Tables 2/3 benchmark the registries and dataset generators; Tables
6-12 benchmark the metric-pair machinery on the shared small grid;
Tables 13/14 benchmark the statistics substrate at the paper's R1
cardinality; Table 15 benchmarks each analysis query.
"""
import dataclasses

import numpy as np
import pytest

from benchmarks.conftest import BENCH_PROTO
from repro.cleaning.registry import ERROR_TYPES, methods_for
from repro.core.protocol import SMOKE
from repro.core.queries import flag_shares, group_attr, run_query
from repro.core.relations import build_pairs_r1, build_pairs_r2, build_pairs_r3
from repro.core.runner import run_unit
from repro.datasets.registry import DATASETS
from repro.stats import by_adjust, paired_ttest


def test_table02_cleaning_method_registry(benchmark):
    """Table 2: enumerate every (error type, detect, repair) method."""
    out = benchmark(lambda: [m for e in ERROR_TYPES for m in methods_for(e)])
    assert len(out) == 6 + 12 + 1 + 1 + 1


def test_table03_dataset_generation(benchmark):
    """Table 3: materialize all 13 base datasets with their errors."""

    def gen():
        return {n: s.generate() for n, s in DATASETS.items() if "_" not in n}

    frames = benchmark.pedantic(gen, rounds=1, iterations=1)
    assert len(frames) == 13


def test_table07_s1_metric_pair(benchmark):
    """Tables 6-7: one spec's metric pair (EEG, outliers, IQR+mean, LR)."""
    proto = dataclasses.replace(
        SMOKE, models=("logistic_regression",), n_splits=1
    )

    def pair():
        rows = run_unit("EEG", "outliers", 100, proto)
        b = rows[
            (rows.train_version == "dirty")
            & (rows.test_variant == "IQR:impute_mean")
        ].test_metric.mean()
        d = rows[
            (rows.train_version == "IQR:impute_mean")
            & (rows.test_variant == "IQR:impute_mean")
        ].test_metric.mean()
        return b, d

    b, d = benchmark.pedantic(pair, rounds=1, iterations=1)
    assert 0 < b <= 1 and 0 < d <= 1


def test_table08_model_selection_r2(benchmark, bench_results):
    """Table 8: best-model selection by validation metric (R2 pairs)."""
    out = benchmark.pedantic(
        lambda: build_pairs_r2(bench_results).count(), rounds=2, iterations=1
    )
    assert out > 0


def test_table09_cleaning_method_selection_r3(benchmark, bench_results):
    """Table 9: best-cleaning-method selection (R3 pairs)."""
    pairs_r2 = build_pairs_r2(bench_results).cache()
    pairs_r2.count()
    out = benchmark.pedantic(
        lambda: build_pairs_r3(pairs_r2).count(), rounds=2, iterations=1
    )
    # One selected method per (dataset, scenario, split).
    assert out == 2 * 2 * BENCH_PROTO.n_splits


def test_table10_11_seed_aggregation_r1(benchmark, bench_results):
    """Tables 10-12: seed-averaged per-split metric pairs (R1 pairs)."""
    out = benchmark.pedantic(
        lambda: build_pairs_r1(bench_results).count(), rounds=2, iterations=1
    )
    # 2 datasets x 12 methods x 3 models x 2 scenarios x 3 splits.
    assert out == 2 * 12 * 3 * 2 * BENCH_PROTO.n_splits


def test_table13_paired_ttests(benchmark):
    """Table 13: the three paired t-tests over 20 metric pairs, at the
    paper's R1 cardinality (~4k specs)."""
    rng = np.random.default_rng(0)
    before = rng.normal(0.8, 0.02, (4000, 20))
    after = before + rng.normal(0.01, 0.02, (4000, 20))

    def run():
        return [paired_ttest(b, a).p_two for b, a in zip(before, after)]

    pvals = benchmark.pedantic(run, rounds=1, iterations=1)
    assert len(pvals) == 4000


def test_table14_by_correction(benchmark):
    """Table 14: BY correction over ~4k R1 p-values."""
    rng = np.random.default_rng(1)
    p = rng.random(3990)
    adj = benchmark(lambda: by_adjust(p))
    assert adj.shape == p.shape


@pytest.mark.parametrize("query", ["Q1", "Q2", "Q3", "Q4.1", "Q4.2", "Q5"])
def test_table15_queries(benchmark, spark, bench_relations, query):
    """Table 15: each analysis query over the flagged relation."""

    def run():
        counts = run_query(spark, query, "R1", "outliers").toPandas()
        return flag_shares(counts, group_attr(query))

    shares = benchmark.pedantic(run, rounds=2, iterations=1)
    assert {"P", "S", "N"} <= set(shares.columns)
