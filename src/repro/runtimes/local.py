"""Local runtime (paper §3 "Local").

State lives in a plain HashMap (``dict``), events in an in-process FIFO
queue; one event is processed at a time, to completion, so execution is
fully deterministic — the paper positions this target for debugging and
unit-testing StateFlow programs before deploying them. State is still
stored as JSON strings so local semantics are byte-identical to the
distributed runtimes (tuples become lists, etc.).

The runtime keeps an event log (every event that crossed the bus) used
by tests to audit dataflow behaviour with the DuckDB oracle.
"""
from __future__ import annotations

import time
from collections import deque
from typing import Any, Dict, List, Optional

from repro.core import serde
from repro.core.events import Event
from repro.core.ir import DataflowIR
from repro.core.routing import partition_key, split_outputs
from repro.core.worker import CompiledIR, handle
from repro.runtimes.base import Runtime


class LocalRuntime(Runtime):
    def __init__(self) -> None:
        super().__init__()
        self.compiled: Optional[CompiledIR] = None
        self.state: Dict[tuple, str] = {}  # (class, key) -> state_json
        self.responses: Dict[str, Any] = {}
        self._done_ts: Dict[str, float] = {}
        self.event_log: List[Event] = []
        self.timings: Dict[str, float] = {}
        self._queue: deque = deque()

    def deploy(self, ir: DataflowIR) -> None:
        self.ir = ir
        self.compiled = CompiledIR.from_ir(ir)

    def submit_call(
        self, class_name: str, key: Any, method: str, args: List[Any]
    ) -> str:
        rid = self.new_request_id()
        self._queue.append(
            Event.call(class_name, key, method, args, request_id=rid)
        )
        self._drain()
        return rid

    def _drain(self) -> None:
        while self._queue:
            ev = self._queue.popleft()
            self.event_log.append(ev)
            pkey = partition_key(ev)
            res = handle(
                self.compiled, ev, self.state.get(pkey), timings=self.timings
            )
            if res.new_state_json is not None:
                self.state[pkey] = res.new_state_json
            loop, out = split_outputs(res.events)
            self._queue.extend(loop)
            for r in out:
                self.event_log.append(r)
                self.responses[r.request_id] = r.payload
                self._done_ts[r.request_id] = time.time() * 1000.0

    def result(self, request_id: str, timeout: float = 30.0) -> Any:
        if request_id not in self.responses:
            raise TimeoutError(f"no response for request {request_id}")
        return self.unwrap_response(self.responses.pop(request_id))

    def response_time_ms(self, request_id: str):
        """Wall-clock ms timestamp when the RESPONSE was produced."""
        return self._done_ts.get(request_id)

    def seed(self, class_name: str, key: Any, state: Dict[str, Any]) -> None:
        self.state[(class_name, str(key))] = serde.dumps(state)

    def get_state(self, class_name: str, key: Any) -> Optional[Dict[str, Any]]:
        s = self.state.get((class_name, str(key)))
        return serde.loads(s) if s is not None else None
