"""Event model (paper Table 1: call arguments are the event *header*,
return values the event *payload*).

Three event kinds flow through every runtime:

* ``CALL``     — invoke ``method`` on entity ``(class_name, key)`` with
  ``args``; carries the caller's execution graph (empty for client
  calls).
* ``RETURN``   — a remote call's return value heading back to the
  suspended caller entity; the execution graph's top frame is the
  caller's.
* ``RESPONSE`` — final result (or error) for the external client,
  correlated by ``request_id``; routed by the egress router out of the
  dataflow.

Events are flat and string-typed so one Spark ``StructType`` covers all
kinds — the streaming runtime reads/writes them as JSON lines.
"""
from __future__ import annotations

import json
import time
import uuid
from dataclasses import dataclass, field
from typing import Any, List, Optional

from pyspark.sql.types import DoubleType, StructField, StructType, StringType

from repro.core import serde

CALL = "CALL"
RETURN = "RETURN"
RESPONSE = "RESPONSE"
#: direct state injection (test/benchmark bootstrap); payload = state dict
SEED = "SEED"

#: Spark schema shared by the file-bus source and the stateful operator.
EVENT_SCHEMA = StructType(
    [
        StructField("event_id", StringType(), False),
        StructField("request_id", StringType(), False),
        StructField("kind", StringType(), False),
        StructField("class_name", StringType(), True),
        StructField("key", StringType(), True),
        StructField("method", StringType(), True),
        StructField("args_json", StringType(), True),
        StructField("exec_graph_json", StringType(), True),
        StructField("payload_json", StringType(), True),
        StructField("ts_ms", DoubleType(), True),
    ]
)

FIELDS = [f.name for f in EVENT_SCHEMA.fields]


@dataclass
class Event:
    kind: str
    class_name: str = ""
    key: str = ""
    method: str = ""
    args_json: str = "[]"
    exec_graph_json: str = ""
    payload_json: str = ""
    request_id: str = ""
    event_id: str = field(default_factory=lambda: uuid.uuid4().hex)
    ts_ms: float = field(default_factory=lambda: time.time() * 1000.0)

    # -- convenience constructors ---------------------------------------

    @staticmethod
    def call(
        class_name: str,
        key: Any,
        method: str,
        args: List[Any],
        *,
        request_id: str,
        exec_graph_json: str = "",
    ) -> "Event":
        return Event(
            kind=CALL,
            class_name=class_name,
            key=str(key),
            method=method,
            args_json=serde.dumps(list(args)),
            exec_graph_json=exec_graph_json,
            request_id=request_id,
        )

    @staticmethod
    def ret(
        class_name: str,
        key: Any,
        value: Any,
        *,
        request_id: str,
        exec_graph_json: str,
    ) -> "Event":
        return Event(
            kind=RETURN,
            class_name=class_name,
            key=str(key),
            payload_json=serde.dumps(value),
            exec_graph_json=exec_graph_json,
            request_id=request_id,
        )

    @staticmethod
    def response(
        request_id: str, *, value: Any = None, error: Optional[str] = None
    ) -> "Event":
        payload = (
            {"ok": False, "error": error}
            if error is not None
            else {"ok": True, "value": value}
        )
        return Event(
            kind=RESPONSE,
            request_id=request_id,
            payload_json=serde.dumps(payload),
        )

    # -- accessors -------------------------------------------------------

    @property
    def args(self) -> List[Any]:
        return serde.loads(self.args_json) if self.args_json else []

    @property
    def payload(self) -> Any:
        return serde.loads(self.payload_json) if self.payload_json else None

    # -- serde -----------------------------------------------------------

    def to_row(self) -> tuple:
        return tuple(getattr(self, f) for f in FIELDS)

    @staticmethod
    def from_row(row) -> "Event":
        return Event(**{f: row[f] for f in FIELDS})

    def to_json_line(self) -> str:
        return json.dumps({f: getattr(self, f) for f in FIELDS})

    @staticmethod
    def from_json_line(line: str) -> "Event":
        return Event(**json.loads(line))
