"""The FastMatch engine: block-choice policies, the round loop for every
§5.2 variant (Scan / SlowMatch / ScanMatch / SyncMatch / FastMatch), and
the calibrated latency model used for Table 4 (see DESIGN.md §2 for why
wall-clock is modeled rather than taken raw from Spark job times).
"""
from repro.engine.runner import (  # noqa: F401
    APPROX_VARIANTS,
    RunResult,
    ScanResult,
    run_scan,
    run_variant,
)
from repro.engine.costmodel import CostModel  # noqa: F401
