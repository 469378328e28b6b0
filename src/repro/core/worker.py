"""Runtime-agnostic event interpreter ("the operator code", paper §2.2).

Every target runtime — local HashMap, FaaS thread pool, Spark batch
supersteps, Structured Streaming — funnels events through
:func:`handle`:

    handle(compiled_ir, event, state_json) -> (new_state_json, [events])

It reconstructs the entity object from the operator state, executes
state-machine nodes until the function completes or suspends at a
remote call, flushes the object back to state, and emits the follow-up
events (CALL to a remote entity, RETURN to a suspended caller, or
RESPONSE to the client). State crosses the API as a JSON string so every
runtime shares identical serialization semantics (the local runtime too,
keeping local == distributed behaviour byte-for-byte).

Generated code ships as *source* inside the IR; each worker process
compiles it once per IR (content-hash cache) — this is what makes the
IR portable to Spark executors without pickling code objects.

``handle`` optionally fills a ``timings`` dict with per-component
durations, the instrumentation behind the paper's system-overhead
experiment (T4): ``construct``/``route``/``split_interp`` are StateFlow's
own overhead, ``state_deser``/``state_ser`` belong to serialization, and
``execute`` is application code.
"""
from __future__ import annotations

import builtins
import hashlib
import json
import time
from dataclasses import dataclass, field
from typing import Any, Callable, Dict, List, Optional, Tuple

from repro.core import serde
from repro.core.entities import Ref
from repro.core.events import CALL, RESPONSE, RETURN, SEED, Event
from repro.core.exec_graph import ExecutionGraph, Frame
from repro.core.ir import DataflowIR, OperatorIR
from repro.core.statemachine import (
    EXIT,
    BlockNode,
    CondNode,
    ForNode,
    RemoteCallNode,
    RET_VAR,
    StateMachine,
)

#: implicit remote-attribute-read method (Listing 1's ``item.price``)
GET_METHOD = "__get__"


def _safe_globals() -> Dict[str, Any]:
    return {"__builtins__": builtins, "Ref": Ref}


class ExecutionError(Exception):
    """Application or interpreter error during event handling."""


class CompiledOperator:
    """Executable form of one :class:`OperatorIR` (per-process)."""

    def __init__(self, op: OperatorIR):
        self.ir = op
        self.class_name = op.class_name
        self.key_var = op.key_var
        self.key_param_index = op.key_param_index
        self.machines = op.machines
        ns = _safe_globals()
        self.simple_fns: Dict[str, Callable] = {}
        self.block_fns: Dict[Tuple[str, int], Callable] = {}
        self.cond_exprs: Dict[Tuple[str, int], Any] = {}
        methods_ns: Dict[str, Callable] = {}
        for mname, sm in op.machines.items():
            if not sm.eligible:
                local_ns = dict(ns)
                exec(sm.simple_source, local_ns)  # noqa: S102 - generated code
                fn = local_ns[mname]
                self.simple_fns[mname] = fn
                if mname != "__init__":
                    methods_ns[mname] = fn
            else:
                for nid, node in sm.nodes.items():
                    if isinstance(node, BlockNode):
                        local_ns = dict(ns)
                        exec(node.source, local_ns)  # noqa: S102
                        self.block_fns[(mname, nid)] = local_ns[node.name]
                    elif isinstance(node, CondNode):
                        self.cond_exprs[(mname, nid)] = compile(
                            node.test_src, f"<{op.class_name}.{mname}>", "eval"
                        )
        # proxy class: instance dict = entity state; simple methods are
        # callable so blocks/simple code can do local self-calls
        self.proxy_cls = type(f"{op.class_name}Proxy", (), methods_ns)

    def make_proxy(self, state: Dict[str, Any]):
        obj = object.__new__(self.proxy_cls)
        obj.__dict__.update(state)
        return obj

    @staticmethod
    def proxy_state(proxy) -> Dict[str, Any]:
        return dict(proxy.__dict__)


class CompiledIR:
    """All operators compiled, cached per process by IR content hash."""

    _cache: Dict[str, "CompiledIR"] = {}

    def __init__(self, ir: DataflowIR):
        self.ir = ir
        self.operators = {
            name: CompiledOperator(op) for name, op in ir.operators.items()
        }

    @classmethod
    def from_json(cls, ir_json: str) -> "CompiledIR":
        h = hashlib.sha256(ir_json.encode()).hexdigest()
        if h not in cls._cache:
            cls._cache[h] = CompiledIR(DataflowIR.from_json(ir_json))
        return cls._cache[h]

    @classmethod
    def from_ir(cls, ir: DataflowIR) -> "CompiledIR":
        return cls.from_json(ir.to_json())


@dataclass
class HandleResult:
    new_state_json: Optional[str]  # None = state unchanged
    events: List[Event] = field(default_factory=list)


def _bind_args(
    sm: StateMachine, args: List[Any], where: str
) -> Dict[str, Any]:
    params = sm.param_names
    if len(args) > len(params):
        raise ExecutionError(
            f"{where}: expected at most {len(params)} args, got {len(args)}"
        )
    bound: Dict[str, Any] = {}
    for i, p in enumerate(params):
        if i < len(args):
            bound[p] = args[i]
        elif p in sm.param_defaults:
            bound[p] = sm.param_defaults[p]
        else:
            raise ExecutionError(f"{where}: missing argument '{p}'")
    return bound


class _Timer:
    """Accumulates component durations into an optional dict."""

    def __init__(self, sink: Optional[Dict[str, float]]):
        self.sink = sink

    def add(self, component: str, seconds: float) -> None:
        if self.sink is not None:
            self.sink[component] = self.sink.get(component, 0.0) + seconds


def handle(
    compiled: CompiledIR,
    event: Event,
    state_json: Optional[str],
    timings: Optional[Dict[str, float]] = None,
) -> HandleResult:
    """Process one event against one entity's state. Never raises:
    failures become RESPONSE error events (abort-this-request semantics;
    the paper has no cross-entity transactions — see its Roadmap)."""
    t = _Timer(timings)
    try:
        return _handle(compiled, event, state_json, t)
    except Exception as e:  # noqa: BLE001 - error becomes a response event
        return HandleResult(
            new_state_json=None,
            events=[
                Event.response(
                    event.request_id,
                    error=f"{type(e).__name__}: {e}",
                )
            ],
        )


def _handle(
    compiled: CompiledIR,
    event: Event,
    state_json: Optional[str],
    t: _Timer,
) -> HandleResult:
    t0 = time.perf_counter()
    graph = ExecutionGraph.from_json(event.exec_graph_json)
    t.add("event_deser", time.perf_counter() - t0)

    if event.kind == SEED:
        # direct state injection (bootstrap path shared by all runtimes)
        return HandleResult(
            new_state_json=event.payload_json,
            events=[Event.response(event.request_id, value=None)],
        )

    if event.kind == CALL and event.method == "__state__":
        # full-state read (debug/audit helper used by Runtime.get_state)
        state = serde.loads(state_json) if state_json is not None else None
        return _complete(compiled, graph, state, None, event, t)

    if event.kind == CALL and event.method == GET_METHOD:
        # implicit remote attribute read
        t0 = time.perf_counter()
        state = serde.loads(state_json) if state_json is not None else None
        t.add("state_deser", time.perf_counter() - t0)
        if state is None:
            raise ExecutionError(
                f"no entity {event.class_name}/{event.key}"
            )
        attr = event.args[0]
        if attr not in state:
            raise ExecutionError(
                f"{event.class_name}/{event.key} has no attribute '{attr}'"
            )
        return _complete(compiled, graph, state[attr], None, event, t)

    if event.kind == CALL:
        op = compiled.operators.get(event.class_name)
        if op is None:
            raise ExecutionError(f"unknown entity class {event.class_name}")
        sm = op.machines.get(event.method)
        if sm is None:
            raise ExecutionError(
                f"{event.class_name} has no method {event.method}"
            )
        t0 = time.perf_counter()
        if event.method == "__init__":
            if state_json is not None:
                raise ExecutionError(
                    f"entity {event.class_name}/{event.key} already exists"
                )
            state: Dict[str, Any] = {}
        else:
            if state_json is None:
                raise ExecutionError(
                    f"no entity {event.class_name}/{event.key}"
                )
            state = serde.loads(state_json)
        t.add("state_deser", time.perf_counter() - t0)
        bound = _bind_args(
            sm, event.args, f"{event.class_name}.{event.method}"
        )
        graph.push(
            Frame(
                class_name=event.class_name,
                key=event.key,
                method=event.method,
                node=sm.entry,
                locals=bound,
            )
        )
        return _run(compiled, graph, state, event, t)

    if event.kind == RETURN:
        if graph.depth == 0:
            raise ExecutionError("RETURN event with empty execution graph")
        frame = graph.top
        if frame.class_name != event.class_name or str(frame.key) != str(
            event.key
        ):
            raise ExecutionError(
                "RETURN routed to wrong entity: frame is "
                f"{frame.class_name}/{frame.key}, event targets "
                f"{event.class_name}/{event.key}"
            )
        t0 = time.perf_counter()
        if state_json is None:
            raise ExecutionError(
                f"entity {event.class_name}/{event.key} disappeared while "
                "suspended"
            )
        state = serde.loads(state_json)
        t.add("state_deser", time.perf_counter() - t0)
        op = compiled.operators[frame.class_name]
        sm = op.machines[frame.method]
        node = sm.nodes[frame.node]
        assert isinstance(node, RemoteCallNode)
        frame.locals[node.result_var] = event.payload
        frame.node = node.next
        return _run(compiled, graph, state, event, t)

    raise ExecutionError(f"worker cannot handle event kind {event.kind}")


def _run(
    compiled: CompiledIR,
    graph: ExecutionGraph,
    state: Dict[str, Any],
    cause: Event,
    t: _Timer,
) -> HandleResult:
    frame = graph.top
    op = compiled.operators[frame.class_name]
    sm = op.machines[frame.method]

    t0 = time.perf_counter()
    proxy = op.make_proxy(state)
    t.add("construct", time.perf_counter() - t0)

    if not sm.eligible:
        t0 = time.perf_counter()
        fn = op.simple_fns[frame.method]
        ret = fn(proxy, **{p: frame.locals[p] for p in sm.param_names})
        t.add("execute", time.perf_counter() - t0)
        return _finish_frame(compiled, graph, ret, proxy, op, cause, t)

    g = _safe_globals()
    g["self"] = proxy
    while True:
        nid = frame.node
        if nid == EXIT:
            ret = frame.locals.get(RET_VAR)
            return _finish_frame(compiled, graph, ret, proxy, op, cause, t)
        node = sm.nodes[nid]
        if isinstance(node, BlockNode):
            fn = op.block_fns[(frame.method, nid)]
            kwargs = {}
            for p in node.params:
                if p not in frame.locals:
                    raise ExecutionError(
                        f"{frame.class_name}.{frame.method}: variable "
                        f"'{p}' referenced before assignment on this path"
                    )
                kwargs[p] = frame.locals[p]
            t0 = time.perf_counter()
            updates = fn(proxy, **kwargs)
            t.add("execute", time.perf_counter() - t0)
            frame.locals.update(updates)
            frame.node = node.next
        elif isinstance(node, CondNode):
            t0 = time.perf_counter()
            val = eval(  # noqa: S307 - compiled local-only test expr
                op.cond_exprs[(frame.method, nid)], g, frame.locals
            )
            t.add("execute", time.perf_counter() - t0)
            frame.node = node.true_next if val else node.false_next
        elif isinstance(node, ForNode):
            t0 = time.perf_counter()
            it = frame.locals[node.iter_var]
            i = frame.locals.get(node.idx_var, 0)
            if i < len(it):
                frame.locals[node.loop_var] = it[i]
                frame.locals[node.idx_var] = i + 1
                frame.node = node.body_next
            else:
                frame.node = node.after_next
            t.add("split_interp", time.perf_counter() - t0)
        elif isinstance(node, RemoteCallNode):
            t0 = time.perf_counter()
            target = frame.locals.get(f"__call_{node.call_id}_target")
            args = frame.locals.get(f"__call_{node.call_id}_args", [])
            frame.node = nid  # resume point: RETURN binds result_var
            if node.call_kind == "create":
                callee_cls = node.method
                callee_op = compiled.operators.get(callee_cls)
                if callee_op is None:
                    raise ExecutionError(f"unknown entity class {callee_cls}")
                if callee_op.key_param_index >= len(args):
                    raise ExecutionError(
                        f"{callee_cls}(): missing key argument "
                        f"'{callee_op.key_var}'"
                    )
                key = args[callee_op.key_param_index]
                method = "__init__"
            else:
                if not isinstance(target, Ref):
                    raise ExecutionError(
                        f"{frame.class_name}.{frame.method}: remote "
                        f"{node.call_kind} on non-entity value "
                        f"{target!r} (expected a Ref)"
                    )
                callee_cls, key = target.class_name, target.key
                if node.call_kind == "get":
                    method = GET_METHOD
                    args = [node.method]
                else:
                    method = node.method
            new_state = CompiledOperator.proxy_state(proxy)
            t.add("split_interp", time.perf_counter() - t0)
            t0 = time.perf_counter()
            state_json = serde.dumps(new_state)
            t.add("state_ser", time.perf_counter() - t0)
            t0 = time.perf_counter()
            ev = Event.call(
                callee_cls,
                key,
                method,
                list(args),
                request_id=cause.request_id,
                exec_graph_json=graph.to_json(),
            )
            t.add("route", time.perf_counter() - t0)
            return HandleResult(new_state_json=state_json, events=[ev])
        else:  # pragma: no cover
            raise ExecutionError(f"unknown node type {type(node).__name__}")


def _finish_frame(
    compiled: CompiledIR,
    graph: ExecutionGraph,
    ret: Any,
    proxy,
    op: CompiledOperator,
    cause: Event,
    t: _Timer,
) -> HandleResult:
    finished = graph.pop()
    t0 = time.perf_counter()
    state = CompiledOperator.proxy_state(proxy)
    state_json = serde.dumps(state)
    t.add("state_ser", time.perf_counter() - t0)
    if finished.method == "__init__":
        if op.key_var not in state:
            raise ExecutionError(
                f"{op.class_name}.__init__ did not set key var "
                f"'{op.key_var}'"
            )
        ret = Ref(op.class_name, state[op.key_var])
    t0 = time.perf_counter()
    if graph.depth > 0:
        caller = graph.top
        ev = Event.ret(
            caller.class_name,
            caller.key,
            ret,
            request_id=cause.request_id,
            exec_graph_json=graph.to_json(),
        )
    else:
        ev = Event.response(cause.request_id, value=ret)
    t.add("route", time.perf_counter() - t0)
    return HandleResult(new_state_json=state_json, events=[ev])


def _complete(
    compiled: CompiledIR,
    graph: ExecutionGraph,
    value: Any,
    new_state_json: Optional[str],
    cause: Event,
    t: _Timer,
) -> HandleResult:
    """Finish a state-less operation (e.g. __get__) without a frame."""
    t0 = time.perf_counter()
    if graph.depth > 0:
        caller = graph.top
        ev = Event.ret(
            caller.class_name,
            caller.key,
            value,
            request_id=cause.request_id,
            exec_graph_json=graph.to_json(),
        )
    else:
        ev = Event.response(cause.request_id, value=value)
    t.add("route", time.perf_counter() - t0)
    return HandleResult(new_state_json=new_state_json, events=[ev])
