"""The round loop implementing every §5.2 approach.

One code path drives all four approximate variants; they differ only in
(a) whether AnyActive block pruning is applied, (b) the granularity at
which block-selection decisions and statistics iterations happen, and
(c) the termination criterion:

===========  ======  ==================  ===========
variant      prune   decision/stats      termination
===========  ======  ==================  ===========
slowmatch    no      per lookahead batch max δ_i ≤ δ/|V_Z|
scanmatch    no      per lookahead batch Σ δ_i ≤ δ
syncmatch    yes     per single block    Σ δ_i ≤ δ
fastmatch    yes     per lookahead batch Σ δ_i ≤ δ
===========  ======  ==================  ===========

Two execution modes share this loop:

* ``mode="spark"`` — each batch's selected blocks are fetched with a
  real Spark filter + ``GROUP BY`` job (the distributed sample+aggregate
  path);
* ``mode="replay"`` — per-block counts come from the prefetched
  :class:`~repro.storage.blocks.BlockCountsIndex`; identical decisions,
  identical blocks read (tested), with statistics / decision cost
  measured on the driver for the cost model.

The loop walks blocks sequentially from a (seeded-random) start with
wraparound — the paper's "linear scan of the shuffled data starting
from any point".  Candidates whose every block has been read are marked
exhausted (their histogram is exact → δ_i = 0), which is how a run that
ends up reading everything terminates with the exact answer.
"""
from __future__ import annotations

import time
from dataclasses import dataclass, field

import numpy as np
import pandas as pd

from repro.core.histsim import HistSimState
from repro.storage.bitmap import mark_lookahead, mark_naive
from repro.storage.blocks import block_counts
from repro.workloads.queries import PreparedQuery


@dataclass(frozen=True)
class VariantSpec:
    prune: bool
    per_block: bool
    criterion: str


APPROX_VARIANTS: dict[str, VariantSpec] = {
    "slowmatch": VariantSpec(prune=False, per_block=False, criterion="slowmatch"),
    "scanmatch": VariantSpec(prune=False, per_block=False, criterion="histsim"),
    "syncmatch": VariantSpec(prune=True, per_block=True, criterion="histsim"),
    "fastmatch": VariantSpec(prune=True, per_block=False, criterion="histsim"),
}


@dataclass
class RunResult:
    """Outcome + counters of one approximate run."""

    variant: str
    qid: str
    eps: float
    delta: float
    lookahead: int
    start_block: int
    mode: str
    topk_idx: np.ndarray           # returned matching set M (indices)
    tau_est: np.ndarray            # final distance estimates τ_i
    est_counts: np.ndarray = field(repr=False, default=None)  # final r_i
    delta_upper: float = float("nan")
    terminated_early: bool = False
    tuples_read: int = 0
    blocks_read: int = 0
    blocks_considered: int = 0
    n_batches: int = 0
    n_stat_iters: int = 0
    time_stats: float = 0.0        # measured HistSim iteration time (s)
    time_decide: float = 0.0       # measured block-selection time (s)
    time_fetch: float = 0.0        # spark-mode fetch time (s); replay gather excluded from model
    wall: float = 0.0


@dataclass
class ScanResult:
    """The exact baseline: full Spark aggregation, measured wall time."""

    qid: str
    topk_idx: np.ndarray
    tau: np.ndarray
    wall: float
    n_rows: int


def _fetch_spark(pq: PreparedQuery, block_ids) -> tuple[np.ndarray, np.ndarray, np.ndarray]:
    """One distributed sample+aggregate round over the selected blocks."""
    pdf = block_counts(
        pq.ds.sdf, pq.spec.z, pq.spec.x, block_ids=block_ids, per_block=False
    ).toPandas()
    zi = pd.Categorical(pdf[pq.spec.z], categories=pq.z_values).codes.astype(np.int64)
    xi = pd.Categorical(pdf[pq.spec.x], categories=pq.x_values).codes.astype(np.int64)
    return zi, xi, pdf["cnt"].to_numpy(dtype=np.int64)


def run_variant(
    pq: PreparedQuery,
    variant: str,
    *,
    eps: float | None = None,
    delta: float = 0.01,
    lookahead: int = 512,
    start_block: int | None = None,
    seed: int | None = None,
    mode: str = "replay",
) -> RunResult:
    """Run one approximate variant to termination (or data exhaustion)."""
    if variant not in APPROX_VARIANTS:
        raise ValueError(f"unknown variant {variant!r}; choose from {sorted(APPROX_VARIANTS)}")
    if mode not in ("replay", "spark"):
        raise ValueError(f"mode must be 'replay' or 'spark', got {mode!r}")
    if lookahead < 1:
        raise ValueError(f"lookahead must be >= 1, got {lookahead}")
    spec = APPROX_VARIANTS[variant]
    eps = float(pq.spec.eps if eps is None else eps)
    n_blocks = pq.ds.n_blocks
    if start_block is None:
        start_block = int(np.random.default_rng(seed).integers(0, n_blocks))
    if not 0 <= start_block < n_blocks:
        raise ValueError(f"start_block must be in [0, {n_blocks}), got {start_block}")

    bitmap = pq.bitmap
    bitmap_t = pq.bitmap_t
    state = HistSimState(pq.n_candidates, pq.target, pq.spec.k, eps, delta)
    remaining = bitmap.sum(axis=1).astype(np.int64)  # blocks left per candidate
    state.mark_exhausted(remaining == 0)             # values absent from the data

    order = np.roll(np.arange(n_blocks, dtype=np.int64), -start_block)
    batch_size = 1 if spec.per_block else lookahead
    res = RunResult(
        variant=variant, qid=pq.spec.qid, eps=eps, delta=delta,
        lookahead=lookahead, start_block=start_block, mode=mode,
        topk_idx=None, tau_est=None,
    )
    wall0 = time.perf_counter()
    pos = 0
    terminated = False
    while pos < n_blocks and not terminated:
        batch = order[pos : pos + batch_size]
        pos += len(batch)
        res.n_batches += 1
        res.blocks_considered += len(batch)

        t0 = time.perf_counter()
        if spec.prune and spec.per_block:
            # SyncMatch: the pre-lookahead Algorithm 2 — probe one
            # candidate bit at a time, per block (the paper's
            # cache-hostile path; here the per-probe Python cost plays
            # the role of the wasted cache line).
            marks = mark_naive(bitmap, np.flatnonzero(state.active()), batch)
        elif spec.prune:
            # FastMatch: Algorithm 3 — one vectorized decision per batch
            # (block-major gather = the whole batch's bits per probe).
            marks = bitmap_t[batch][:, state.active()].any(axis=1)
        else:
            marks = np.ones(len(batch), dtype=bool)
        res.time_decide += time.perf_counter() - t0
        to_read = batch[marks]
        if len(to_read) == 0:
            continue

        t0 = time.perf_counter()
        if mode == "spark":
            zi, xi, cnt = _fetch_spark(pq, to_read)
        else:
            zi, xi, cnt = pq.counts_index.gather(to_read)
        res.time_fetch += time.perf_counter() - t0

        t0 = time.perf_counter()
        state.update(zi, xi, cnt)
        remaining -= bitmap_t[to_read].sum(axis=0)
        state.mark_exhausted(remaining == 0)
        state.iterate()
        res.time_stats += time.perf_counter() - t0
        res.n_stat_iters += 1

        res.tuples_read += int(cnt.sum())
        res.blocks_read += len(to_read)
        terminated = state.terminated(spec.criterion)

    if state.last is None:  # pathological: nothing was ever read
        state.iterate()
    res.wall = time.perf_counter() - wall0
    res.terminated_early = terminated
    res.topk_idx = state.topk_indices()
    res.tau_est = state.last.tau
    res.est_counts = state.counts
    res.delta_upper = state.last.delta_upper
    return res


def run_scan(pq: PreparedQuery) -> ScanResult:
    """The exact ``Scan`` baseline: one full Spark aggregation, timed.

    Computes every candidate's histogram and its distance to the target
    through the distributed path (``repro.core.distance``), then takes
    the top-k on the driver.  Always correct; its measured wall time
    calibrates the cost model's per-tuple I/O rate.
    """
    from repro.core.distance import candidate_distances

    t0 = time.perf_counter()
    target_map = {xv: float(q) for xv, q in zip(pq.x_values, pq.target)}
    pdf = candidate_distances(pq.ds.sdf, pq.spec.z, pq.spec.x, target_map).toPandas()
    wall = time.perf_counter() - t0
    zi = pd.Categorical(pdf[pq.spec.z], categories=pq.z_values).codes.astype(np.int64)
    tau = np.full(pq.n_candidates, 2.0)
    tau[zi] = pdf["dist"].to_numpy(dtype=np.float64)
    topk = np.argsort(tau, kind="stable")[: pq.spec.k]
    return ScanResult(qid=pq.spec.qid, topk_idx=topk, tau=tau, wall=wall, n_rows=pq.ds.n_rows)
