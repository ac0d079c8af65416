"""Benchmark fixtures: datasets at benchmark SF (REPRO_BENCH_SF, default
0.1 ≈ 600k rows/dataset) shared across benchmark modules."""
from __future__ import annotations

import os

import pytest

from repro.workloads.queries import QUERIES, load_dataset, prepare

SF_BENCH = float(os.environ.get("REPRO_BENCH_SF", "0.1"))


@pytest.fixture(scope="session")
def bench_datasets(spark):
    return {
        name: load_dataset(spark, name, sf=SF_BENCH)
        for name in ("flights", "taxi", "police")
    }


@pytest.fixture(scope="session")
def bench_prepared(bench_datasets):
    return {
        qid: prepare(bench_datasets[spec.dataset], spec)
        for qid, spec in QUERIES.items()
    }
