"""Entrypoint for T5 — abstraction / lines-of-code comparison.

Usage: python jobs/loc_table.py
"""
from repro.bench.harness import format_table
from repro.bench.loc import loc_report


def run():
    r = loc_report()
    rows = [
        {
            "implementation": "stateflow entities (business logic only)",
            "loc": r.stateflow_loc,
        },
        {
            "implementation": "explicit baseline — total",
            "loc": r.baseline_total,
        },
        {
            "implementation": (
                f"explicit baseline — infrastructure "
                f"({r.baseline_infra_pct:.0f}%)"
            ),
            "loc": r.baseline_infra,
        },
        {
            "implementation": "explicit baseline — business logic",
            "loc": r.baseline_business,
        },
    ] + [
        {"implementation": f"runtime adapter: {k}", "loc": v}
        for k, v in sorted(r.adapter_loc.items())
    ]
    print("\nT5 — LOC comparison (paper §4 'StateFlow's abstraction')\n")
    print(format_table(rows, ["implementation", "loc"]))
    return r


if __name__ == "__main__":
    run()
