"""Runtime interface (paper §3).

Every target runtime deploys a :class:`~repro.core.ir.DataflowIR` and
then serves entity invocations. The surface is deliberately tiny — the
paper reports 87–169 LOC per target adapter; ours are in the same range
(measured by the T5 LOC bench).

``call``/``create`` are the synchronous client convenience wrappers;
``submit_*`` + ``result`` expose the asynchronous path the throughput
experiments drive.
"""
from __future__ import annotations

import uuid
from abc import ABC, abstractmethod
from typing import Any, Dict, List, Optional

from repro.core import serde
from repro.core.entities import Ref
from repro.core.ir import DataflowIR


class EntityError(RuntimeError):
    """An invocation failed inside the dataflow (error RESPONSE)."""


class Runtime(ABC):
    def __init__(self) -> None:
        self.ir: Optional[DataflowIR] = None

    @abstractmethod
    def deploy(self, ir: DataflowIR) -> None:
        """Translate + deploy the IR; must be called before any call."""

    @abstractmethod
    def submit_call(
        self, class_name: str, key: Any, method: str, args: List[Any]
    ) -> str:
        """Asynchronously invoke; returns a request id."""

    @abstractmethod
    def result(self, request_id: str, timeout: float = 30.0) -> Any:
        """Await a request's RESPONSE payload; raises EntityError on
        application errors, TimeoutError if nothing arrives in time."""

    @abstractmethod
    def seed(self, class_name: str, key: Any, state: Dict[str, Any]) -> None:
        """Directly inject entity state (test/benchmark bootstrap that
        bypasses the event bus)."""

    def close(self) -> None:  # pragma: no cover - trivial default
        """Tear down any deployed resources."""

    # -- synchronous conveniences ---------------------------------------

    def call(self, class_name: str, key: Any, method: str, *args: Any) -> Any:
        return self.result(self.submit_call(class_name, key, method, list(args)))

    def create(self, class_name: str, *args: Any) -> Ref:
        op = self.ir.operators[class_name]
        key = args[op.key_param_index]
        return self.result(
            self.submit_call(class_name, key, "__init__", list(args))
        )

    def call_ref(self, ref: Ref, method: str, *args: Any) -> Any:
        return self.call(ref.class_name, ref.key, method, *args)

    # -- helpers shared by implementations ------------------------------

    @staticmethod
    def new_request_id() -> str:
        return uuid.uuid4().hex

    @staticmethod
    def unwrap_response(payload: Any) -> Any:
        if not isinstance(payload, dict) or "ok" not in payload:
            raise EntityError(f"malformed response payload: {payload!r}")
        if not payload["ok"]:
            raise EntityError(payload.get("error", "unknown error"))
        return payload.get("value")

    def get_state(self, class_name: str, key: Any) -> Optional[Dict[str, Any]]:
        """Read an entity's current state (debug/audit helper)."""
        raise NotImplementedError

    @staticmethod
    def encode_state(state: Dict[str, Any]) -> str:
        return serde.dumps(state)
