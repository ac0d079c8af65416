"""Table 2 benchmark: dataset generation + Spark materialization cost.

One benchmark per dataset at benchmark SF — the substrate work behind
Table 2's row counts (generation is the analog of the paper's
preprocessing/shuffling pass).
"""
import pytest

from repro.workloads.datasets import generate
from benchmarks.conftest import SF_BENCH


@pytest.mark.parametrize("name", ["flights", "taxi", "police"])
def test_generate_dataset(benchmark, name):
    pdf, meta = benchmark.pedantic(
        lambda: generate(name, sf=SF_BENCH), rounds=1, iterations=1
    )
    assert len(pdf) == meta.n_rows
