"""Calibrated latency model arithmetic."""
import numpy as np
import pytest

from repro.engine.costmodel import CostModel
from repro.engine.runner import RunResult, ScanResult


def _scan(wall=10.0, n=1_000_000):
    return ScanResult(qid="x", topk_idx=np.array([0]), tau=np.zeros(1), wall=wall, n_rows=n)


def _run(tuples=100_000, stats=0.5, decide=0.1):
    return RunResult(
        variant="fastmatch", qid="x", eps=0.1, delta=0.01, lookahead=512,
        start_block=0, mode="replay", topk_idx=np.array([0]), tau_est=np.zeros(1),
        tuples_read=tuples, time_stats=stats, time_decide=decide,
    )


def test_calibration():
    cm = CostModel.calibrate(_scan())
    assert cm.tuple_rate == pytest.approx(1e-5)
    assert cm.scan_seconds == 10.0


def test_modeled_seconds_decomposition():
    cm = CostModel.calibrate(_scan())
    assert cm.modeled_seconds(_run()) == pytest.approx(1.0 + 0.5 + 0.1)


def test_speedup():
    cm = CostModel.calibrate(_scan())
    assert cm.speedup(_run()) == pytest.approx(10.0 / 1.6)


def test_full_read_speedup_below_one():
    """Reading everything plus any overhead can never beat Scan."""
    cm = CostModel.calibrate(_scan())
    assert cm.speedup(_run(tuples=1_000_000, stats=1.0)) < 1.0


@pytest.mark.parametrize("wall,n", [(0.0, 100), (1.0, 0)])
def test_bad_calibration_raises(wall, n):
    with pytest.raises(ValueError):
        CostModel.calibrate(_scan(wall=wall, n=n))
