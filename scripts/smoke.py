"""Quick end-to-end smoke of the pipeline at tiny SF (dev tool)."""
import os
import sys
import time

sys.path.insert(0, os.path.dirname(os.path.dirname(os.path.abspath(__file__))))
import conftest  # noqa: F401  (sets PYSPARK_SUBMIT_ARGS before pyspark import)

from pyspark.sql import SparkSession

spark = (
    SparkSession.builder.appName("smoke")
    .config("spark.sql.shuffle.partitions", "16")
    .config("spark.sql.execution.arrow.pyspark.enabled", "true")
    .config("spark.sql.autoBroadcastJoinThreshold", -1)
    .getOrCreate()
)
spark.sparkContext.setLogLevel("ERROR")

from repro.workloads.queries import QUERIES, load_dataset, prepare
from repro.tables.table4 import run_query_experiment

t0 = time.time()
ds = load_dataset(spark, "flights", sf=0.02)
print(f"loaded flights sf=0.02: {ds.n_rows} rows, {ds.n_blocks} blocks in {time.time()-t0:.1f}s")

for qid in ["flights-q1", "flights-q2", "flights-q3", "flights-q4"]:
    t0 = time.time()
    pq = prepare(ds, QUERIES[qid])
    print(f"\n{qid}: prepared in {time.time()-t0:.1f}s; target={pq.target_desc}")
    print("  true top-k:", [pq.z_values[i] for i in pq.true_topk()])
    print("  tau* sorted[:15]:", [round(float(t), 3) for t in sorted(pq.tau_star)[:15]])
    exp = run_query_experiment(pq, n_runs=2, seed=1)
    for v, s in exp.variants.items():
        print(
            f"  {v:<10} speedup={s.speedup:7.2f}x read={s.read_fraction:6.1%} "
            f"stats={s.time_stats*1e3:7.1f}ms decide={s.time_decide*1e3:6.1f}ms "
            f"iters={s.n_stat_iters:7.1f} viol={s.guarantee_violations} dd={s.delta_d_mean:.4f}"
        )
    print(f"  scan={exp.scan_seconds:.2f}s")

spark.stop()
