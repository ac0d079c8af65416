"""Workloads: synthetic analogs of the paper's datasets and queries.

* :mod:`repro.workloads.datasets` — FLIGHTS / TAXI / POLICE generators
  (Table 2 analogs), deterministic in (sf, seed).
* :mod:`repro.workloads.queries` — the nine Table 3 query specs and
  target computation, plus :func:`repro.workloads.queries.prepare`
  which builds everything a run needs (blocked Spark DataFrame, vocabularies,
  bitmap, counts index, exact ground truth).
"""
