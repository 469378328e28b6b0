"""spark-submit entrypoint for T3 — latency vs. throughput (Fig. 4).

Usage: spark-submit jobs/throughput_table.py [--quick]
"""
import sys

from pyspark.sql import SparkSession

from repro.bench.harness import format_table, overall_stats, run_open_loop
from repro.core.ir import build_ir
from repro.deathstar.entities import ALL_ENTITIES
from repro.deathstar.workload import (
    RequestGenerator,
    generate_dataset,
    seed_rows,
)
from repro.runtimes.faas import FaasRuntime
from repro.runtimes.spark_dataflow import SparkDataflowRuntime

LADDERS = {
    "faas": [25, 50, 100, 200],
    "dataflow": [2, 5, 10, 20, 40],
    "dataflow_hybrid": [2, 5, 10],
}


def run(spark: SparkSession, quick: bool = False):
    ir = build_ir(ALL_ENTITIES)
    ds = generate_dataset(n_hotels=40, n_users=50, n_regions=4)
    rows = []
    for name, ladder in LADDERS.items():
        if quick:
            ladder = ladder[:2]
        if name == "faas":
            rt = FaasRuntime(max_concurrency=64)
            rt.deploy(ir)
            for row in seed_rows(ds):
                rt.seed(*row)
        else:
            trigger = "250 milliseconds" if name == "dataflow_hybrid" else None
            rt = SparkDataflowRuntime(
                spark, trigger_interval=trigger, name=f"job-t3-{name}"
            )
            rt.deploy(ir)
            rt.seed_many(seed_rows(ds))
        try:
            for rps in ladder:
                gen = RequestGenerator(ds, seed=4321)
                n = max(10, int(rps * 5.0))
                stats = overall_stats(
                    run_open_loop(rt, gen.batch(n), rps=float(rps), timeout=600)
                )
                rows.append(
                    {
                        "runtime": name,
                        "rps": rps,
                        "n": stats.n,
                        "avg_ms": stats.avg_ms,
                        "p99_ms": stats.p99_ms,
                    }
                )
        finally:
            rt.close()
    print("\nT3 — mixed-workload latency vs. throughput (paper Fig. 4)\n")
    print(format_table(rows, ["runtime", "rps", "n", "avg_ms", "p99_ms"]))
    return rows


if __name__ == "__main__":
    spark = (
        SparkSession.builder.appName("t3-throughput-table")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .getOrCreate()
    )
    run(spark, quick="--quick" in sys.argv)
    spark.stop()
