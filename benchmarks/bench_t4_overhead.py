"""T4 — per-event component overhead vs. state size (paper §4 "System
overhead": synthetic workload, state 50–200 KB, StateFlow responsible
for <1% of total overhead).

Rows print with a ``[T4]`` prefix: per-component µs/event and the share
attributed to StateFlow itself (object construction + state-machine
bookkeeping + routing) vs. serialization, state storage, and the
application function.
"""
from __future__ import annotations

import pytest

from repro.bench.harness import emit
from repro.bench.overhead import (
    APP_COMPONENTS,
    SERDE_COMPONENTS,
    STATEFLOW_COMPONENTS,
    STORE_COMPONENTS,
    measure_overhead,
)

STATE_KBS = [50, 100, 150, 200]


@pytest.mark.parametrize("state_kb", STATE_KBS)
def test_t4_overhead(benchmark, state_kb):
    row = benchmark.pedantic(
        measure_overhead,
        kwargs=dict(state_kb=state_kb, n_events=300),
        rounds=1,
        iterations=1,
    )
    benchmark.extra_info.update(
        state_kb=state_kb,
        total_us=round(row.total_us, 1),
        stateflow_us=round(row.stateflow_us, 2),
        stateflow_pct=round(row.stateflow_pct, 3),
        serde_pct=round(row.pct(SERDE_COMPONENTS), 2),
        store_pct=round(row.pct(STORE_COMPONENTS), 2),
        execute_pct=round(row.pct(APP_COMPONENTS), 2),
    )
    emit(
        f"[T4] state_kb={state_kb} total_us={row.total_us:.1f} "
        f"stateflow_pct={row.stateflow_pct:.2f} "
        f"serde_pct={row.pct(SERDE_COMPONENTS):.1f} "
        f"store_pct={row.pct(STORE_COMPONENTS):.1f} "
        f"execute_pct={row.pct(APP_COMPONENTS):.1f} "
        f"components={ {k: round(v, 1) for k, v in row.components_us.items()} }"
    )
    # the paper's conclusion: StateFlow itself is a negligible slice
    assert row.stateflow_pct < 10.0
    assert row.total_us > 0
