"""System-overhead breakdown (experiment T4, paper §4 "System overhead").

The paper runs a synthetic workload with state sizes from 50 to 200 KB,
times the runtime components of each event, attributes some (object
construction, routing) to StateFlow and the rest (state storage,
serialization) to the runtime, and concludes StateFlow causes <1% of
total overhead.

We reproduce this with a ``Blob`` entity whose state carries a payload
of the requested size. For each event we measure, via the worker's
timing hooks plus explicit KV-store timings:

* ``construct``     — rebuilding the entity object from state  (StateFlow)
* ``split_interp``  — state-machine bookkeeping                (StateFlow)
* ``route``         — building outgoing events                 (StateFlow)
* ``event_deser``   — event decoding                           (runtime/serde)
* ``state_deser`` / ``state_ser`` — state (de)serialization    (runtime/serde)
* ``store_read`` / ``store_write`` — external state storage    (runtime)
* ``execute``       — the application function itself
"""
from __future__ import annotations

import time
from dataclasses import dataclass
from typing import Dict, List

from repro.core.entities import stateflow
from repro.core.events import Event
from repro.core.ir import DataflowIR, build_ir
from repro.core.worker import CompiledIR, handle
from repro.runtimes.kvstore import KVStore

STATEFLOW_COMPONENTS = ("construct", "split_interp", "route")
SERDE_COMPONENTS = ("event_deser", "state_deser", "state_ser")
STORE_COMPONENTS = ("store_read", "store_write")
APP_COMPONENTS = ("execute",)


@stateflow
class Blob:
    """Synthetic entity with a payload of configurable size."""

    def __init__(self, blob_id: str, payload: str):
        self.blob_id: str = blob_id
        self.payload: str = payload
        self.counter: int = 0

    def __key__(self):
        return self.blob_id

    def bump(self, n: int) -> int:
        self.counter += n
        return self.counter


def blob_ir() -> DataflowIR:
    return build_ir([Blob])


@dataclass
class OverheadRow:
    state_kb: int
    events: int
    total_us: float  # mean per event
    components_us: Dict[str, float]  # mean per event

    @property
    def stateflow_us(self) -> float:
        return sum(self.components_us.get(c, 0.0) for c in STATEFLOW_COMPONENTS)

    @property
    def stateflow_pct(self) -> float:
        return 100.0 * self.stateflow_us / self.total_us if self.total_us else 0.0

    def pct(self, components) -> float:
        s = sum(self.components_us.get(c, 0.0) for c in components)
        return 100.0 * s / self.total_us if self.total_us else 0.0


def measure_overhead(
    state_kb: int, n_events: int = 200, use_store: bool = True
) -> OverheadRow:
    """Run ``n_events`` ``bump`` calls against a Blob of ``state_kb`` KB
    state through the full read-state → handle → write-state path."""
    compiled = CompiledIR.from_ir(blob_ir())
    payload = "x" * (state_kb * 1024)
    kv = KVStore() if use_store else None
    timings: Dict[str, float] = {}
    key = f"blob-{state_kb}"
    # bootstrap through a real __init__ event
    init = Event.call("Blob", key, "__init__", [key, payload], request_id="seed")
    res = handle(compiled, init, None, timings={})
    state_json = res.new_state_json
    if kv is not None:
        kv.put("Blob", key, state_json)
    t_total0 = time.perf_counter()
    for i in range(n_events):
        ev = Event.call("Blob", key, "bump", [1], request_id=f"r{i}")
        if kv is not None:
            t0 = time.perf_counter()
            state_json = kv.get("Blob", key)
            timings["store_read"] = timings.get("store_read", 0.0) + (
                time.perf_counter() - t0
            )
        res = handle(compiled, ev, state_json, timings=timings)
        state_json = res.new_state_json
        if kv is not None:
            t0 = time.perf_counter()
            kv.put("Blob", key, state_json)
            timings["store_write"] = timings.get("store_write", 0.0) + (
                time.perf_counter() - t0
            )
    total = time.perf_counter() - t_total0
    if kv is not None:
        kv.close()
    per_event_us = {c: 1e6 * v / n_events for c, v in timings.items()}
    return OverheadRow(
        state_kb=state_kb,
        events=n_events,
        total_us=1e6 * total / n_events,
        components_us=per_event_us,
    )


def overhead_table(
    state_kbs: List[int] = (50, 100, 150, 200), n_events: int = 200
) -> List[OverheadRow]:
    return [measure_overhead(kb, n_events) for kb in state_kbs]
