"""spark-submit entrypoint for T2 — per-endpoint latency table (Fig. 3).

Usage: spark-submit jobs/latency_table.py [--quick]

Prints one row per (runtime, endpoint) cell; the same code path as
benchmarks/bench_t2_endpoint_latency.py, runnable standalone.
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

ENDPOINTS = ["login", "search", "recommend", "reserve"]


def run(spark: SparkSession, quick: bool = False):
    ir = build_ir(ALL_ENTITIES)
    ds = generate_dataset(n_hotels=40, n_users=50, n_regions=4)
    configs = [
        ("faas", None, 20, 10.0),
        ("dataflow", "stream:none", 8, 4.0),
        ("dataflow_hybrid", "stream:250 milliseconds", 8, 4.0),
        ("dataflow_slow", "stream:3 seconds", 4, 2.0),
    ]
    if quick:
        configs = configs[:2]
    rows = []
    for name, kind, n, rps in configs:
        if kind is None:
            rt = FaasRuntime(max_concurrency=32)
            rt.deploy(ir)
            for row in seed_rows(ds):
                rt.seed(*row)
        else:
            trigger = kind.split(":", 1)[1]
            rt = SparkDataflowRuntime(
                spark,
                trigger_interval=None if trigger == "none" else trigger,
                name=f"job-{name}",
            )
            rt.deploy(ir)
            rt.seed_many(seed_rows(ds))
        try:
            for ep in ENDPOINTS:
                gen = RequestGenerator(ds, seed=1234)
                stats = overall_stats(
                    run_open_loop(rt, gen.batch(n, ep), rps=rps, timeout=600)
                )
                rows.append(
                    {
                        "runtime": name,
                        "endpoint": ep,
                        "n": stats.n,
                        "avg_ms": stats.avg_ms,
                        "p50_ms": stats.p50_ms,
                        "p99_ms": stats.p99_ms,
                    }
                )
        finally:
            rt.close()
    print("\nT2 — average latency per endpoint (paper Fig. 3)\n")
    print(
        format_table(
            rows, ["runtime", "endpoint", "n", "avg_ms", "p50_ms", "p99_ms"]
        )
    )
    return rows


if __name__ == "__main__":
    spark = (
        SparkSession.builder.appName("t2-latency-table")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .getOrCreate()
    )
    run(spark, quick="--quick" in sys.argv)
    spark.stop()
