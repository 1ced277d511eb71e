"""Shared fixtures for the per-table benchmarks: one small grid run
(outliers on EEG + Sensor at smoke scale) reused by every bench."""
import dataclasses

import pytest

from repro.core.harness import run_grid
from repro.core.protocol import SMOKE
from repro.core.relations import build_relations
from repro.core.queries import register_relations

BENCH_PROTO = dataclasses.replace(SMOKE, n_splits=3)


@pytest.fixture(scope="session")
def bench_results(spark):
    sdf = run_grid(
        spark, BENCH_PROTO, error_types=("outliers",), datasets=("EEG", "Sensor")
    ).cache()
    sdf.count()  # materialize once so benches measure their own stage
    return sdf


@pytest.fixture(scope="session")
def bench_relations(spark, bench_results):
    relations = build_relations(bench_results)
    register_relations(spark, relations)
    return relations
