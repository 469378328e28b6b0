"""T1 — paper Table 1 (OO → dataflow translation), emitted as a table
plus the compile cost of the full DeathStar service. Rows print with a
``[T1]`` prefix; the structural assertions live in
tests/test_ir_worker.py::TestTable1Translation.
"""
from __future__ import annotations

from repro.bench.harness import emit
from repro.core.ir import build_ir
from repro.deathstar.entities import ALL_ENTITIES


def test_t1_translation(benchmark):
    ir = benchmark(build_ir, ALL_ENTITIES)
    rows = [
        ("Class", "Operator", f"{len(ir.operators)} classes -> operators"),
        (
            "Object State",
            "Operator State",
            f"{sum(len(o.state_vars) for o in ir.operators.values())} state vars",
        ),
        (
            "Function Call Arguments",
            "Event (Header)",
            f"{sum(len(o.machines) for o in ir.operators.values())} methods",
        ),
        (
            "Return Value",
            "Event (Payload)",
            f"{len(ir.edges)} operator-to-operator edges",
        ),
    ]
    for py, df, note in rows:
        emit(f"[T1] python={py!r} dataflow={df!r} ({note})")
    split = sum(
        len(o.split_methods()) for o in ir.operators.values()
    )
    emit(f"[T1] split_methods={split} dataflow_nodes={ir.dataflow_nodes()}")
    assert len(ir.operators) == len(ALL_ENTITIES)
