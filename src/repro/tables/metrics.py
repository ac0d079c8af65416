"""§5.3 metrics: guarantee satisfaction and total relative error Δ_d.

All three take the *exact* ground truth (true distances τ*, exact
counts) produced by :func:`repro.workloads.queries.prepare`.
"""
from __future__ import annotations

import numpy as np

from repro.core.distance import normalize_rows


def guarantee1_satisfied(output_idx, tau_star: np.ndarray, k: int, eps: float) -> bool:
    """Separation: every true-top-k candidate missing from the output is
    less than ε closer to the target than the furthest returned one:
    max_{l ∈ output} τ*_l − τ*_j < ε for all true-top-k j not output.
    """
    output_idx = np.asarray(output_idx)
    if len(output_idx) != k:
        raise ValueError(f"output has {len(output_idx)} candidates, expected k={k}")
    true_topk = set(np.argsort(tau_star, kind="stable")[:k].tolist())
    missing = true_topk - set(output_idx.tolist())
    if not missing:
        return True
    worst_out = float(tau_star[output_idx].max())
    return all(worst_out - float(tau_star[j]) < eps for j in missing)


def guarantee2_satisfied(
    output_idx, est_counts: np.ndarray, exact_counts: np.ndarray, eps: float
) -> bool:
    """Reconstruction: every returned histogram estimate is < ε from its
    true normalized histogram in ℓ₁.
    """
    output_idx = np.asarray(output_idx)
    est = normalize_rows(est_counts[output_idx])
    tru = normalize_rows(exact_counts[output_idx])
    dev = np.abs(est - tru).sum(axis=1)
    return bool((dev < eps).all())


def delta_d(output_idx, tau_star: np.ndarray, k: int) -> float:
    """Total relative error in visual distance (§5.3), using true
    distances of the returned set versus the true top-k — always ≥ 0,
    0 when the output is distance-equivalent to the optimum.
    """
    output_idx = np.asarray(output_idx)
    if len(output_idx) != k:
        raise ValueError(f"output has {len(output_idx)} candidates, expected k={k}")
    best = np.sort(tau_star, kind="stable")[:k].sum()
    if best <= 0:
        # Degenerate: true top-k all at distance 0; any deviation is "infinite"
        # relative error unless the output also sums to 0.
        got = tau_star[output_idx].sum()
        return 0.0 if got <= 0 else float("inf")
    return float((tau_star[output_idx].sum() - best) / best)
