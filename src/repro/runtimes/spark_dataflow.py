"""Structured Streaming runtime — the paper's dataflow target and the
core of this reproduction (repro hint: "map stateful entities compiler
IR to Structured Streaming stateful operators (mapGroupsWithState)").

Topology (mirrors paper §3 "Dataflow"):

* a file-source topic (Kafka substitute) feeds events into the query;
* the **ingress router** is the ``groupBy(class_name, key)`` — Spark's
  keyBy — which partitions events to the stateful operator instance
  owning that entity;
* the stateful operator is ``applyInPandasWithState`` (PySpark's
  mapGroupsWithState): per-key ``GroupState`` holds the entity's state
  JSON; the handler runs the worker interpreter over the group's events;
* the **egress router** is a ``foreachBatch`` sink: RESPONSE events are
  delivered to the waiting client, CALL/RETURN events are looped back
  onto the ingress topic — the Kafka re-entry that stands in for cyclic
  dataflows.

Checkpointing on the query + replayable file source give the
exactly-once state guarantees the paper inherits from Flink/Statefun.

``trigger_interval`` configures the variants used in the experiments:
``None`` (process as fast as possible) ≈ Statefun; ``"250
milliseconds"`` ≈ the FlinkJVM hybrid; ``"3 seconds"`` ≈ the unbatched
PyFlink prototype (per-hop overhead dominates; see DESIGN.md
substitutions table).
"""
from __future__ import annotations

import os
import shutil
import tempfile
import threading
import time
from typing import Any, Dict, Iterator, List, Optional, Tuple

import pandas as pd
from pyspark.sql import SparkSession
from pyspark.sql.streaming.state import GroupState, GroupStateTimeout
from pyspark.sql.types import StringType, StructField, StructType

from repro.core import serde
from repro.core.events import EVENT_SCHEMA, FIELDS, RESPONSE, Event
from repro.core.ir import DataflowIR
from repro.core.worker import CompiledIR, handle
from repro.runtimes.base import Runtime
from repro.runtimes.filebus import FileTopic

STATE_SCHEMA = StructType([StructField("state_json", StringType(), True)])


def _make_operator_fn(ir_json: str):
    """Build the applyInPandasWithState handler (ships to executors).

    Closes over the IR as JSON; each executor process compiles it once
    (content-hash cache in CompiledIR).
    """

    def operator_fn(
        key: Tuple[str, str],
        pdfs: Iterator[pd.DataFrame],
        state: GroupState,
    ) -> Iterator[pd.DataFrame]:
        compiled = CompiledIR.from_json(ir_json)
        cur: Optional[str] = None
        if state.exists:
            cur = state.get[0]
        rows: List[tuple] = []
        events: List[Event] = []
        for pdf in pdfs:
            for rec in pdf.to_dict("records"):
                events.append(Event(**{f: rec[f] for f in FIELDS}))
        # deterministic order within the micro-batch
        events.sort(key=lambda e: (e.ts_ms, e.event_id))
        for ev in events:
            res = handle(compiled, ev, cur)
            if res.new_state_json is not None:
                cur = res.new_state_json
            rows.extend(out.to_row() for out in res.events)
        if cur is not None:
            state.update((cur,))
        yield pd.DataFrame(rows, columns=FIELDS)

    return operator_fn


class SparkDataflowRuntime(Runtime):
    """The Structured Streaming target."""

    def __init__(
        self,
        spark: SparkSession,
        trigger_interval: Optional[str] = None,
        name: str = "dataflow",
    ):
        super().__init__()
        self.spark = spark
        self.trigger_interval = trigger_interval
        self.name = name
        self.workdir: Optional[str] = None
        self.ingress: Optional[FileTopic] = None
        self.query = None
        self._responses: Dict[str, Any] = {}
        self._response_ts: Dict[str, float] = {}
        self._cond = threading.Condition()
        self.batches_seen = 0

    # -- deployment ------------------------------------------------------

    def deploy(self, ir: DataflowIR) -> None:
        self.ir = ir
        ir_json = ir.to_json()
        self.workdir = tempfile.mkdtemp(prefix=f"stateflow-{self.name}-")
        ingress_dir = os.path.join(self.workdir, "ingress")
        checkpoint_dir = os.path.join(self.workdir, "checkpoint")
        self.ingress = FileTopic(ingress_dir)
        # publish a no-op marker so the source directory is never empty
        # at query start (the file source requires the path to exist)
        source = (
            self.spark.readStream.schema(EVENT_SCHEMA)
            .option("maxFilesPerTrigger", 1000)
            .json(ingress_dir)
        )
        stateful = source.groupBy("class_name", "key").applyInPandasWithState(
            _make_operator_fn(ir_json),
            outputStructType=EVENT_SCHEMA,
            stateStructType=STATE_SCHEMA,
            outputMode="update",
            timeoutConf=GroupStateTimeout.NoTimeout,
        )
        writer = (
            stateful.writeStream.outputMode("update")
            .foreachBatch(self._route_batch)
            .option("checkpointLocation", checkpoint_dir)
        )
        if self.trigger_interval is not None:
            writer = writer.trigger(processingTime=self.trigger_interval)
        # The stateful operator pins its partition count when the first
        # micro-batch is planned; 4 state partitions keeps per-hop
        # latency low on a single machine. The previous value is
        # restored at close() (a restore right after start() could race
        # the first batch's planning).
        self._prev_shuffle = self.spark.conf.get("spark.sql.shuffle.partitions")
        self.spark.conf.set("spark.sql.shuffle.partitions", "4")
        self.query = writer.queryName(f"stateflow-{self.name}").start()

    # -- egress router ---------------------------------------------------

    def _route_batch(self, batch_df, batch_id: int) -> None:
        rows = batch_df.collect()
        now = time.time() * 1000.0
        loop: List[Event] = []
        with self._cond:
            self.batches_seen += 1
            for row in rows:
                ev = Event.from_row(row)
                if ev.kind == RESPONSE:
                    self._responses[ev.request_id] = ev.payload
                    self._response_ts[ev.request_id] = now
                else:
                    loop.append(ev)
            self._cond.notify_all()
        if loop:
            self.ingress.publish(loop)

    # -- client API ------------------------------------------------------

    def submit_call(
        self, class_name: str, key: Any, method: str, args: List[Any]
    ) -> str:
        rid = self.new_request_id()
        self.ingress.publish(
            [Event.call(class_name, key, method, args, request_id=rid)]
        )
        return rid

    def submit_many(self, events: List[Event]) -> None:
        """Publish a pre-built batch of client CALL events (bench path)."""
        self.ingress.publish(events)

    def result(self, request_id: str, timeout: float = 60.0) -> Any:
        deadline = time.time() + timeout
        with self._cond:
            while request_id not in self._responses:
                remaining = deadline - time.time()
                if remaining <= 0:
                    raise TimeoutError(
                        f"no response for {request_id} after {timeout}s "
                        f"(batches seen: {self.batches_seen})"
                    )
                self._cond.wait(timeout=min(remaining, 0.5))
            return self.unwrap_response(self._responses.pop(request_id))

    def response_time_ms(self, request_id: str) -> Optional[float]:
        """Wall-clock ms timestamp when the RESPONSE was routed."""
        return self._response_ts.get(request_id)

    def drain(self, request_ids: List[str], timeout: float = 120.0) -> Dict[str, Any]:
        """Await many requests; returns request_id -> raw payload."""
        deadline = time.time() + timeout
        out: Dict[str, Any] = {}
        with self._cond:
            pending = set(request_ids)
            while pending:
                done = pending & self._responses.keys()
                for rid in done:
                    out[rid] = self._responses.pop(rid)
                pending -= done
                if not pending:
                    break
                remaining = deadline - time.time()
                if remaining <= 0:
                    raise TimeoutError(
                        f"{len(pending)} responses still pending after "
                        f"{timeout}s (batches seen: {self.batches_seen})"
                    )
                self._cond.wait(timeout=min(remaining, 0.5))
        return out

    def seed(self, class_name: str, key: Any, state: Dict[str, Any]) -> None:
        rid = self.new_request_id()
        ev = Event(
            kind="SEED",
            class_name=class_name,
            key=str(key),
            payload_json=serde.dumps(state),
            request_id=rid,
        )
        self.ingress.publish([ev])
        self.result(rid, timeout=60.0)

    def seed_many(self, rows: List[Tuple[str, Any, Dict[str, Any]]]) -> None:
        """Seed many entities in one published batch, then await all."""
        events, rids = [], []
        for class_name, key, state in rows:
            rid = self.new_request_id()
            rids.append(rid)
            events.append(
                Event(
                    kind="SEED",
                    class_name=class_name,
                    key=str(key),
                    payload_json=serde.dumps(state),
                    request_id=rid,
                )
            )
        self.ingress.publish(events)
        self.drain(rids, timeout=120.0)

    def get_state(self, class_name: str, key: Any) -> Optional[Dict[str, Any]]:
        return self.call(class_name, key, "__state__")

    def close(self) -> None:
        if getattr(self, "_prev_shuffle", None) is not None:
            self.spark.conf.set(
                "spark.sql.shuffle.partitions", self._prev_shuffle
            )
        if self.query is not None:
            try:
                self.query.stop()
                self.query.awaitTermination(10)
            except Exception:  # noqa: BLE001 - teardown best-effort
                pass
        if self.workdir and os.path.isdir(self.workdir):
            shutil.rmtree(self.workdir, ignore_errors=True)
