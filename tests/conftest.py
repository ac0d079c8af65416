"""Shared fixtures: session-scoped small datasets and prepared queries.

Everything here runs at SF_TEST = 0.01 (~60k rows per dataset) so the
whole suite exercises the real Spark paths while staying fast.  The
``spark`` fixture itself comes from the repo-root conftest.
"""
from __future__ import annotations

import pytest

from repro.workloads.queries import QUERIES, load_dataset, prepare

SF_TEST = 0.01


@pytest.fixture(scope="session")
def datasets(spark):
    """All three workload datasets, generated once and cached in Spark."""
    return {
        name: load_dataset(spark, name, sf=SF_TEST)
        for name in ("flights", "taxi", "police")
    }


@pytest.fixture(scope="session")
def prepared(datasets):
    """All nine Table 3 queries, fully prepared (indexes + ground truth)."""
    return {
        qid: prepare(datasets[spec.dataset], spec) for qid, spec in QUERIES.items()
    }


@pytest.fixture(scope="session")
def flights_pq(prepared):
    return prepared["flights-q1"]
