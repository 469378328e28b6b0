"""T3 — avg and p99 latency vs. throughput, mixed workload (paper
Fig. 4: search 60%, recommend 39%, login/reserve 0.5% each).

The paper sweeps 1200→4300 RPS on an 8-TaskManager Flink cluster and a
1000-way Lambda; on one machine we sweep a proportionally scaled RPS
ladder per runtime. Shape to reproduce: Lambda-like stays flat into
hundreds of RPS; the Statefun-like dataflow saturates at tens of RPS
with p99 rising steeply; the hybrid sits between. The PyFlink-like
variant is *absent*, as in the paper ("PyFlink is absent due to its
poor performance leading to timeouts even at very low throughputs").
Rows print with a ``[T3]`` prefix.
"""
from __future__ import annotations

import pytest

from repro.bench.harness import emit, overall_stats, run_open_loop
from repro.core.ir import build_ir
from repro.deathstar.entities import ALL_ENTITIES
from repro.deathstar.workload import (
    RequestGenerator,
    generate_dataset,
    seed_rows,
)
from repro.runtimes.faas import FaasRuntime
from repro.runtimes.spark_dataflow import SparkDataflowRuntime

#: per-runtime RPS ladders (scaled down from the paper's 1200..4300)
LADDERS = {
    "faas": [25, 50, 100, 200],
    "dataflow": [2, 5, 10, 20, 40],
    "dataflow_hybrid": [2, 5, 10],
}

DURATION_S = 5.0
MIN_REQUESTS = 10


class _Manager:
    def __init__(self, spark):
        self.spark = spark
        self.ir = build_ir(ALL_ENTITIES)
        self.ds = generate_dataset(n_hotels=40, n_users=50, n_regions=4)
        self.current_name = None
        self.current = None

    def get(self, name: str):
        if self.current_name == name:
            return self.current
        if self.current is not None:
            self.current.close()
        if name == "faas":
            rt = FaasRuntime(max_concurrency=64)
            rt.deploy(self.ir)
            for row in seed_rows(self.ds):
                rt.seed(*row)
        else:
            trigger = "250 milliseconds" if name == "dataflow_hybrid" else None
            rt = SparkDataflowRuntime(
                self.spark, trigger_interval=trigger, name=f"t3-{name}"
            )
            rt.deploy(self.ir)
            rt.seed_many(seed_rows(self.ds))
            self._warmup(rt)
        self.current_name, self.current = name, rt
        return rt

    def _warmup(self, rt):
        gen = RequestGenerator(self.ds, seed=999)
        rids = [
            rt.submit_call(r.class_name, r.key, r.method, r.args)
            for r in (
                gen.batch(2, "login")
                + gen.batch(1, "search")
                + gen.batch(1, "recommend")
                + gen.batch(1, "reserve")
            )
        ]
        rt.drain(rids, timeout=300)

    def close(self):
        if self.current is not None:
            self.current.close()


@pytest.fixture(scope="module")
def manager(spark):
    m = _Manager(spark)
    yield m
    m.close()


CELLS = [(r, rps) for r, ladder in LADDERS.items() for rps in ladder]


@pytest.mark.parametrize(
    ("runtime_name", "rps"), CELLS, ids=[f"{r}-{rps}rps" for r, rps in CELLS]
)
def test_t3_throughput(benchmark, manager, runtime_name, rps):
    import zlib

    rt = manager.get(runtime_name)
    gen = RequestGenerator(
        manager.ds, seed=zlib.crc32(f"{runtime_name}-{rps}".encode())
    )
    n = max(MIN_REQUESTS, int(rps * DURATION_S))

    def cell():
        return run_open_loop(rt, gen.batch(n), rps=float(rps), timeout=600.0)

    measured = benchmark.pedantic(cell, rounds=1, iterations=1)
    stats = overall_stats(measured)
    benchmark.extra_info.update(
        runtime=runtime_name,
        rps=rps,
        n=stats.n,
        ok=stats.ok,
        avg_ms=round(stats.avg_ms, 2),
        p99_ms=round(stats.p99_ms, 2),
    )
    emit(
        f"[T3] runtime={runtime_name} rps={rps} n={stats.n} ok={stats.ok} "
        f"avg_ms={stats.avg_ms:.1f} p99_ms={stats.p99_ms:.1f}"
    )
    assert stats.ok == stats.n
