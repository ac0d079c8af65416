"""Storage substrate: randomly-permuted blocked layout + bitmap index.

The paper's FastMatch reads 4 KiB disk blocks over a randomly permuted
row-store (§4.2 Challenge 1).  Here a *block* is a ``_block_id`` column
over the (already exchangeable) generated row order; per-block counts
and the per-(candidate, block) bitmap index are built with Spark
DataFrame aggregations.
"""
from repro.storage.blocks import (  # noqa: F401
    BLOCK_COL,
    BlockCountsIndex,
    add_block_ids,
    block_counts,
    build_counts_index,
    with_blocks_spark,
)
from repro.storage.bitmap import (  # noqa: F401
    bitmap_from_index,
    build_bitmap,
    mark_lookahead,
    mark_naive,
)
