"""Entrypoint for T1 — the paper's Table 1 translation, as realized by
the compiled DeathStar IR.

Usage: python jobs/translation_table.py
"""
from repro.bench.harness import format_table
from repro.core.ir import build_ir
from repro.deathstar.entities import ALL_ENTITIES


def run():
    ir = build_ir(ALL_ENTITIES)
    rows = [
        {
            "python": "Class",
            "dataflow": "Operator",
            "in_this_ir": f"{len(ir.operators)} operators",
        },
        {
            "python": "Object State",
            "dataflow": "Operator State",
            "in_this_ir": (
                f"{sum(len(o.state_vars) for o in ir.operators.values())} "
                "state vars, keyed per entity"
            ),
        },
        {
            "python": "Function Call Arguments",
            "dataflow": "Event (Header)",
            "in_this_ir": (
                f"{sum(len(o.machines) for o in ir.operators.values())} "
                "methods invocable via CALL events"
            ),
        },
        {
            "python": "Return Value",
            "dataflow": "Event (Payload)",
            "in_this_ir": "RETURN/RESPONSE payloads",
        },
    ]
    print("\nT1 — OO-to-dataflow translation (paper Table 1)\n")
    print(format_table(rows, ["python", "dataflow", "in_this_ir"]))
    print("\nDataflow vertices:", ", ".join(ir.dataflow_nodes()))
    print("Operator edges:", sorted(ir.edges))
    return ir


if __name__ == "__main__":
    run()
