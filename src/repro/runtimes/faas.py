"""FaaS runtime — the AWS Lambda substitute (paper §3 "FaaS").

In the paper's Lambda target "a single Lambda invocation will execute a
full function with all the split function blocks in it": the ingress
routes an event to the appropriate function block and the egress routes
the output back to the ingress until the request is processed in full.
State lives in an external store (DynamoDB there, :class:`KVStore`
here) **without locking**.

We model each request as one "invocation driver" running on a bounded
thread pool (the Lambda concurrency limit): the driver loops
ingress → read state → execute block(s) → write state → egress,
hop by hop, exactly the paper's loop. Concurrency across requests is
real, so the no-locking read-modify-write race on shared entities is
real too (tested).
"""
from __future__ import annotations

import threading
import time
from concurrent.futures import Future, ThreadPoolExecutor
from typing import Any, Dict, List, Optional

from repro.core import serde
from repro.core.events import Event
from repro.core.ir import DataflowIR
from repro.core.routing import partition_key, split_outputs
from repro.core.worker import CompiledIR, handle
from repro.runtimes.base import Runtime
from repro.runtimes.kvstore import KVStore


class FaasRuntime(Runtime):
    def __init__(self, max_concurrency: int = 32, kv_path: Optional[str] = None):
        super().__init__()
        self.max_concurrency = max_concurrency
        self._kv_path = kv_path
        self.compiled: Optional[CompiledIR] = None
        self.kv: Optional[KVStore] = None
        self._pool: Optional[ThreadPoolExecutor] = None
        self._futures: Dict[str, Future] = {}
        self._lock = threading.Lock()
        self.invocations = 0  # total event hops (≈ Lambda invocations)
        self._done_ts: Dict[str, float] = {}

    def deploy(self, ir: DataflowIR) -> None:
        self.ir = ir
        self.compiled = CompiledIR.from_ir(ir)
        self.kv = KVStore(self._kv_path)
        self._pool = ThreadPoolExecutor(
            max_workers=self.max_concurrency,
            thread_name_prefix="lambda",
        )

    def submit_call(
        self, class_name: str, key: Any, method: str, args: List[Any]
    ) -> str:
        rid = self.new_request_id()
        ev = Event.call(class_name, key, method, args, request_id=rid)
        fut = self._pool.submit(self._drive_request, ev)
        with self._lock:
            self._futures[rid] = fut
        return rid

    def _drive_request(self, event: Event) -> Any:
        """The ingress/egress loop for one client request."""
        queue = [event]
        while queue:
            ev = queue.pop(0)
            with self._lock:
                self.invocations += 1
            cls, key = partition_key(ev)
            state = self.kv.get(cls, key)  # read from external store
            res = handle(self.compiled, ev, state)
            if res.new_state_json is not None:
                self.kv.put(cls, key, res.new_state_json)  # no lock held
            loop, out = split_outputs(res.events)
            queue.extend(loop)
            if out:
                with self._lock:
                    self._done_ts[event.request_id] = time.time() * 1000.0
                return out[0].payload
        raise RuntimeError("request finished without a RESPONSE event")

    def response_time_ms(self, request_id: str) -> Optional[float]:
        with self._lock:
            return self._done_ts.get(request_id)

    def result(self, request_id: str, timeout: float = 30.0) -> Any:
        with self._lock:
            fut = self._futures.pop(request_id)
        return self.unwrap_response(fut.result(timeout=timeout))

    def seed(self, class_name: str, key: Any, state: Dict[str, Any]) -> None:
        self.kv.put(class_name, str(key), serde.dumps(state))

    def get_state(self, class_name: str, key: Any) -> Optional[Dict[str, Any]]:
        s = self.kv.get(class_name, str(key))
        return serde.loads(s) if s is not None else None

    def close(self) -> None:
        if self._pool is not None:
            self._pool.shutdown(wait=False, cancel_futures=True)
        if self.kv is not None:
            self.kv.close()
