"""Table 2 analog — dataset descriptions, ours next to the paper's."""
from __future__ import annotations

from pyspark.sql import SparkSession

from repro.workloads.queries import load_dataset

PAPER_TABLE2 = {
    "flights": {"size": "32 GiB", "tuples": 604_000_000, "attrs": 7, "replications": 5},
    "taxi": {"size": "36 GiB", "tuples": 677_000_000, "attrs": 7, "replications": 4},
    "police": {"size": "29 GiB", "tuples": 382_000_000, "attrs": 10, "replications": 72},
}


def rows(spark: SparkSession, *, sf: float, tuples_per_block: int = 64) -> list[dict]:
    """One row per dataset: paper figures + our synthetic analog's."""
    out = []
    for name, paper in PAPER_TABLE2.items():
        ds = load_dataset(spark, name, sf=sf, tuples_per_block=tuples_per_block)
        n_attrs = len([c for c in ds.sdf.columns if c != "_block_id"])
        out.append(
            {
                "dataset": name.upper(),
                "paper_tuples": paper["tuples"],
                "paper_attrs": paper["attrs"],
                "ours_tuples": ds.n_rows,
                "ours_attrs": n_attrs,
                "ours_blocks": ds.n_blocks,
                "tuples_per_block": ds.tuples_per_block,
                "cardinalities": {
                    c: len(v) for c, v in ds.meta.value_sets.items()
                },
            }
        )
        ds.sdf.unpersist()
    return out


def format_table(rs: list[dict]) -> str:
    lines = [
        f"{'Dataset':<9} {'#Tuples(paper)':>15} {'#Tuples(ours)':>14} "
        f"{'#Attrs(p/o)':>12} {'#Blocks':>9}  Cardinalities"
    ]
    for r in rs:
        cards = ", ".join(f"{c}={n}" for c, n in r["cardinalities"].items())
        lines.append(
            f"{r['dataset']:<9} {r['paper_tuples']:>15,} {r['ours_tuples']:>14,} "
            f"{r['paper_attrs']:>5}/{r['ours_attrs']:<6} {r['ours_blocks']:>9,}  {cards}"
        )
    return "\n".join(lines)
