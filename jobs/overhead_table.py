"""Entrypoint for T4 — system-overhead breakdown per state size.

Usage: python jobs/overhead_table.py   (no Spark needed — the overhead
experiment measures the worker + state-store path directly, as the
paper's did for runtime components)
"""
from repro.bench.harness import format_table
from repro.bench.overhead import (
    APP_COMPONENTS,
    SERDE_COMPONENTS,
    STORE_COMPONENTS,
    overhead_table,
)


def run():
    rows = []
    for r in overhead_table([50, 100, 150, 200], n_events=300):
        rows.append(
            {
                "state_kb": r.state_kb,
                "total_us_per_event": r.total_us,
                "stateflow_us": r.stateflow_us,
                "stateflow_pct": r.stateflow_pct,
                "serde_pct": r.pct(SERDE_COMPONENTS),
                "store_pct": r.pct(STORE_COMPONENTS),
                "app_pct": r.pct(APP_COMPONENTS),
            }
        )
    print("\nT4 — per-event overhead breakdown (paper §4 'System overhead')\n")
    print(
        format_table(
            rows,
            [
                "state_kb",
                "total_us_per_event",
                "stateflow_us",
                "stateflow_pct",
                "serde_pct",
                "store_pct",
                "app_pct",
            ],
        )
    )
    return rows


if __name__ == "__main__":
    run()
