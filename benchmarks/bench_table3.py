"""Table 3 benchmark: target resolution via the exact distributed path.

One benchmark per query: the full ``prepare`` pipeline (per-block Spark
aggregation, bitmap, exact ground truth, target computation) that backs
each Table 3 row.
"""
import pytest

from repro.workloads.queries import QUERIES, prepare


@pytest.mark.parametrize("qid", sorted(QUERIES))
def test_prepare_query(benchmark, qid, bench_datasets):
    spec = QUERIES[qid]
    pq = benchmark.pedantic(
        lambda: prepare(bench_datasets[spec.dataset], spec), rounds=1, iterations=1
    )
    assert pq.exact_counts.sum() == pq.ds.n_rows
