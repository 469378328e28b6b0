"""Batch BSP runtime — the Apache Beam stand-in (DESIGN.md).

The paper lists Apache Beam as a target but could not produce numbers
for it (open bugs prevented cluster deployment). This runtime
demonstrates the same IR portability claim on Spark's *batch* engine:
each superstep cogroups the pending events with the touched entities'
state by ``(class_name, key)`` (Catalyst ``FlatMapCoGroupsInPandas``),
runs the worker interpreter per entity, and loops the emitted
CALL/RETURN events into the next superstep until only RESPONSEs remain
— a BSP rendering of the dataflow with the same ingress keyBy and
egress loop-back as the streaming target.

Intended for deterministic batch execution of many requests at once
(integration tests, state audits); latency experiments use the
streaming/FaaS runtimes.
"""
from __future__ import annotations

from typing import Any, Dict, List, Optional, Tuple

import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F
from pyspark.sql.types import StringType, StructField, StructType

from repro.core import serde
from repro.core.events import EVENT_SCHEMA, FIELDS, RESPONSE, Event
from repro.core.ir import DataflowIR
from repro.core.worker import CompiledIR, handle
from repro.runtimes.base import Runtime

STATE_DF_SCHEMA = StructType(
    [
        StructField("class_name", StringType(), False),
        StructField("key", StringType(), False),
        StructField("state_json", StringType(), False),
    ]
)

#: superstep output: either an event row or an updated-state row
OUT_SCHEMA = StructType(
    list(EVENT_SCHEMA.fields)
    + [
        StructField("out_kind", StringType(), False),
        StructField("state_json", StringType(), True),
    ]
)

_EMPTY_EVENT = {f: "" for f in FIELDS}
_EMPTY_EVENT["ts_ms"] = 0.0


def _make_step_fn(ir_json: str):
    def step_fn(
        key: Tuple[str, str], events_pdf: pd.DataFrame, state_pdf: pd.DataFrame
    ) -> pd.DataFrame:
        compiled = CompiledIR.from_json(ir_json)
        cur: Optional[str] = (
            state_pdf["state_json"].iloc[0] if len(state_pdf) else None
        )
        events = [
            Event(**{f: rec[f] for f in FIELDS})
            for rec in events_pdf.to_dict("records")
        ]
        events.sort(key=lambda e: (e.ts_ms, e.event_id))
        rows: List[dict] = []
        for ev in events:
            res = handle(compiled, ev, cur)
            if res.new_state_json is not None:
                cur = res.new_state_json
            for out in res.events:
                row = {f: getattr(out, f) for f in FIELDS}
                row["out_kind"] = "event"
                row["state_json"] = None
                rows.append(row)
        if cur is not None:
            srow = dict(_EMPTY_EVENT)
            srow["class_name"], srow["key"] = key
            srow["out_kind"] = "state"
            srow["state_json"] = cur
            rows.append(srow)
        return pd.DataFrame(rows, columns=[f.name for f in OUT_SCHEMA.fields])

    return step_fn


class SparkSuperstepRuntime(Runtime):
    def __init__(self, spark: SparkSession, max_supersteps: int = 500):
        super().__init__()
        self.spark = spark
        self.max_supersteps = max_supersteps
        self._ir_json: Optional[str] = None
        self.state_df: Optional[DataFrame] = None
        self._pending: List[Event] = []
        self._responses: Dict[str, Any] = {}
        self.supersteps_run = 0

    def deploy(self, ir: DataflowIR) -> None:
        self.ir = ir
        self._ir_json = ir.to_json()
        self.state_df = self.spark.createDataFrame([], STATE_DF_SCHEMA)

    # -- client API ------------------------------------------------------

    def submit_call(
        self, class_name: str, key: Any, method: str, args: List[Any]
    ) -> str:
        rid = self.new_request_id()
        self._pending.append(
            Event.call(class_name, key, method, args, request_id=rid)
        )
        return rid

    def result(self, request_id: str, timeout: float = 300.0) -> Any:
        if request_id not in self._responses:
            self.flush()
        if request_id not in self._responses:
            raise TimeoutError(f"no response for {request_id}")
        return self.unwrap_response(self._responses.pop(request_id))

    # -- the BSP loop ----------------------------------------------------

    def flush(self) -> int:
        """Run supersteps until no CALL/RETURN events remain.

        Returns the number of supersteps executed for this flush.
        """
        steps = 0
        pending = self._pending
        self._pending = []
        step_fn = _make_step_fn(self._ir_json)
        while pending:
            steps += 1
            self.supersteps_run += 1
            if steps > self.max_supersteps:
                raise RuntimeError(
                    f"superstep limit ({self.max_supersteps}) exceeded — "
                    "likely an event loop"
                )
            ev_df = self.spark.createDataFrame(
                [e.to_row() for e in pending], EVENT_SCHEMA
            )
            touched = self.state_df.join(
                ev_df.select("class_name", "key").distinct(),
                on=["class_name", "key"],
                how="semi",
            )
            out = (
                ev_df.groupBy("class_name", "key")
                .cogroup(touched.groupBy("class_name", "key"))
                .applyInPandas(step_fn, OUT_SCHEMA)
            )
            out = out.localCheckpoint(eager=True)
            new_state = out.filter(F.col("out_kind") == "state").select(
                "class_name", "key", "state_json"
            )
            untouched = self.state_df.join(
                ev_df.select("class_name", "key").distinct(),
                on=["class_name", "key"],
                how="anti",
            )
            self.state_df = untouched.union(new_state).localCheckpoint(
                eager=True
            )
            pending = []
            for row in out.filter(F.col("out_kind") == "event").collect():
                ev = Event.from_row(row)
                if ev.kind == RESPONSE:
                    self._responses[ev.request_id] = ev.payload
                else:
                    pending.append(ev)
        return steps

    # -- state bootstrap / audit ----------------------------------------

    def seed(self, class_name: str, key: Any, state: Dict[str, Any]) -> None:
        self.seed_many([(class_name, key, state)])

    def seed_many(self, rows: List[Tuple[str, Any, Dict[str, Any]]]) -> None:
        df = self.spark.createDataFrame(
            [(c, str(k), serde.dumps(s)) for c, k, s in rows],
            STATE_DF_SCHEMA,
        )
        replaced = self.state_df.join(
            df.select("class_name", "key").distinct(),
            on=["class_name", "key"],
            how="anti",
        )
        self.state_df = replaced.union(df).localCheckpoint(eager=True)

    def get_state(self, class_name: str, key: Any) -> Optional[Dict[str, Any]]:
        rows = (
            self.state_df.filter(
                (F.col("class_name") == class_name)
                & (F.col("key") == str(key))
            )
            .select("state_json")
            .collect()
        )
        return serde.loads(rows[0][0]) if rows else None

    def state_snapshot(self) -> DataFrame:
        """The full entity-state DataFrame (for DuckDB oracle audits)."""
        return self.state_df
