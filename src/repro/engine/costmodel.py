"""Calibrated latency model for Table 4 (see DESIGN.md §2).

The paper reports wall-clock on a C++ engine reading tmpfs blocks; a
Spark substrate has ~10⁻¹ s fixed per-job overhead that would swamp the
sub-second latencies FastMatch targets.  Following the decomposition
the paper's §4 argues governs variant ranking, a run's latency is
modeled as

    modeled = tuples_read × tuple_rate + time_stats + time_decide

where ``tuple_rate`` is calibrated from the *measured* wall time of the
exact Spark ``Scan`` over the same data (so Scan's modeled latency is
by construction its measured latency), and ``time_stats`` /
``time_decide`` are the *measured* driver-side costs of the variant's
own HistSim iterations and block-selection decisions.  SyncMatch pays
per-block statistics (the paper's Challenge 3), FastMatch amortizes one
vectorized decision over a lookahead batch — exactly the effects the
model must preserve.
"""
from __future__ import annotations

from dataclasses import dataclass

from repro.engine.runner import RunResult, ScanResult


@dataclass(frozen=True)
class CostModel:
    """Per-tuple I/O rate (seconds/tuple) + total rows, from a Scan run."""

    tuple_rate: float
    n_rows: int
    scan_seconds: float

    @classmethod
    def calibrate(cls, scan: ScanResult) -> "CostModel":
        if scan.n_rows < 1 or scan.wall <= 0:
            raise ValueError("scan result must have positive rows and wall time")
        return cls(
            tuple_rate=scan.wall / scan.n_rows,
            n_rows=scan.n_rows,
            scan_seconds=scan.wall,
        )

    def modeled_seconds(self, res: RunResult) -> float:
        """Modeled end-to-end latency of an approximate run."""
        return res.tuples_read * self.tuple_rate + res.time_stats + res.time_decide

    def speedup(self, res: RunResult) -> float:
        """Speedup over Scan — the quantity Table 4 reports."""
        return self.scan_seconds / self.modeled_seconds(res)
