"""Bench-scale sanity: one FLIGHTS and one TAXI query at SF=0.4 (dev tool)."""
import os
import sys
import time

sys.path.insert(0, os.path.dirname(os.path.dirname(os.path.abspath(__file__))))
import conftest  # noqa: F401

from pyspark.sql import SparkSession

spark = (
    SparkSession.builder.appName("smoke-bench")
    .config("spark.sql.shuffle.partitions", "32")
    .config("spark.sql.execution.arrow.pyspark.enabled", "true")
    .config("spark.sql.autoBroadcastJoinThreshold", -1)
    .getOrCreate()
)
spark.sparkContext.setLogLevel("ERROR")

from repro.workloads.queries import QUERIES, load_dataset, prepare
from repro.tables.table4 import run_query_experiment

which = sys.argv[1:] or ["flights-q1", "flights-q2", "taxi-q1"]
ds_cache = {}
for qid in which:
    spec = QUERIES[qid]
    if spec.dataset not in ds_cache:
        t0 = time.time()
        ds_cache[spec.dataset] = load_dataset(spark, spec.dataset, sf=0.4)
        d = ds_cache[spec.dataset]
        print(f"loaded {spec.dataset}: {d.n_rows} rows, {d.n_blocks} blocks in {time.time()-t0:.1f}s")
    t0 = time.time()
    pq = prepare(ds_cache[spec.dataset], spec)
    print(f"\n{qid}: prepared in {time.time()-t0:.1f}s; eps={spec.eps} target={pq.target_desc}")
    print("  tau* sorted[:16]:", [round(float(t), 3) for t in sorted(pq.tau_star)[:16]])
    exp = run_query_experiment(pq, n_runs=2, seed=1)
    print(f"  scan={exp.scan_seconds:.2f}s")
    for v, s in exp.variants.items():
        print(
            f"  {v:<10} speedup={s.speedup:7.2f}x modeled={s.modeled_seconds:6.3f}s read={s.read_fraction:6.1%} "
            f"stats={s.time_stats*1e3:8.1f}ms decide={s.time_decide*1e3:7.1f}ms "
            f"iters={s.n_stat_iters:8.1f} viol={s.guarantee_violations} dd={s.delta_d_mean:.4f}"
        )
spark.stop()
