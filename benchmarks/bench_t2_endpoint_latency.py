"""T2 — average latency per DeathStar endpoint (paper Fig. 3, 10 RPS).

Cells: endpoint × runtime. Runtime analogues (DESIGN.md substitutions):
``faas`` ≈ AWS Lambda+DynamoDB, ``dataflow`` ≈ Flink Statefun,
``dataflow_hybrid`` ≈ FlinkJVM, ``dataflow_slow`` ≈ PyFlink.

The paper's shape to reproduce: Lambda fastest by a wide margin; the
dataflow targets pay per-hop bus roundtrips (search, with nine entity
calls, is worst); the unbatched/slow variant is an order of magnitude
beyond that. Rows print with a ``[T2]`` prefix for EXPERIMENTS.md.
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
from repro.runtimes.local import LocalRuntime
from repro.runtimes.spark_dataflow import SparkDataflowRuntime

ENDPOINTS = ["login", "search", "recommend", "reserve"]

RUNTIMES = {
    "local": dict(kind="local", n=20, rps=10.0),
    "faas": dict(kind="faas", n=20, rps=10.0),
    "dataflow": dict(kind="stream", trigger=None, n=8, rps=4.0),
    "dataflow_hybrid": dict(
        kind="stream", trigger="250 milliseconds", n=8, rps=4.0
    ),
    "dataflow_slow": dict(kind="stream", trigger="3 seconds", n=4, rps=2.0),
}


class _Manager:
    """Deploys one runtime at a time (streaming queries are heavy)."""

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
        cfg = RUNTIMES[name]
        if cfg["kind"] == "local":
            rt = LocalRuntime()
            rt.deploy(self.ir)
            for row in seed_rows(self.ds):
                rt.seed(*row)
        elif cfg["kind"] == "faas":
            rt = FaasRuntime(max_concurrency=32)
            rt.deploy(self.ir)
            for row in seed_rows(self.ds):
                rt.seed(*row)
        else:
            rt = SparkDataflowRuntime(
                self.spark, trigger_interval=cfg["trigger"], name=f"t2-{name}"
            )
            rt.deploy(self.ir)
            rt.seed_many(seed_rows(self.ds))
            _warmup(rt, self.ds)
        self.current_name, self.current = name, rt
        return rt

    def close(self):
        if self.current is not None:
            self.current.close()
            self.current = None


def _warmup(rt, ds):
    """Drive every operator once so JIT/python-worker spin-up costs are
    not billed to the first measured cell."""
    gen = RequestGenerator(ds, seed=999)
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


def _seed(name: str, endpoint: str) -> int:
    import zlib

    return zlib.crc32(f"{name}-{endpoint}".encode())


@pytest.fixture(scope="module")
def manager(spark):
    m = _Manager(spark)
    yield m
    m.close()


CELLS = [(r, e) for r in RUNTIMES for e in ENDPOINTS]


@pytest.mark.parametrize(
    ("runtime_name", "endpoint"), CELLS, ids=[f"{r}-{e}" for r, e in CELLS]
)
def test_t2_endpoint_latency(benchmark, manager, runtime_name, endpoint):
    cfg = RUNTIMES[runtime_name]
    rt = manager.get(runtime_name)
    gen = RequestGenerator(manager.ds, seed=_seed(runtime_name, endpoint))

    def cell():
        reqs = gen.batch(cfg["n"], endpoint)
        return run_open_loop(rt, reqs, rps=cfg["rps"], timeout=600.0)

    measured = benchmark.pedantic(cell, rounds=1, iterations=1)
    stats = overall_stats(measured)
    benchmark.extra_info.update(
        runtime=runtime_name,
        endpoint=endpoint,
        avg_ms=round(stats.avg_ms, 2),
        p50_ms=round(stats.p50_ms, 2),
        p99_ms=round(stats.p99_ms, 2),
        ok=stats.ok,
        n=stats.n,
    )
    emit(
        f"[T2] runtime={runtime_name} endpoint={endpoint} "
        f"n={stats.n} ok={stats.ok} avg_ms={stats.avg_ms:.1f} "
        f"p50_ms={stats.p50_ms:.1f} p99_ms={stats.p99_ms:.1f}"
    )
    assert stats.ok == stats.n
