"""State-machine representation of a split function (paper §2.3).

Each eligible method compiles into a graph of nodes. Execution walks the
graph; a :class:`RemoteCallNode` is where execution *suspends* until the
remote entity's return value comes back in a RETURN event.

Node kinds and their transitions:

* :class:`BlockNode`  — straight-line statements (generated, paper-style,
  as a function taking the variables it *uses* and returning the
  variables it *defines*); one ``next`` edge.
* :class:`RemoteCallNode` — suspension point; the preceding block has
  evaluated the call target and arguments into hidden locals
  (``__call_K_target`` / ``__call_K_args``); on resume the return value
  is bound to ``result_var``; one ``next`` edge.
* :class:`CondNode`   — evaluates a local-only test expression;
  ``true_next`` / ``false_next`` edges. Also serves as a while-loop head
  (its body's tail loops back to it).
* :class:`ForNode`    — iterates a materialized list (hidden local
  ``iter_var``) with a hidden index; ``body_next`` / ``after_next``.
* ``EXIT`` (id ``-1``) — function end; the return value is the hidden
  local ``__ret`` (absent ⇒ ``None``).

All nodes are JSON-serializable so the whole machine ships inside the
IR to Spark executors.
"""
from __future__ import annotations

from dataclasses import dataclass, field
from typing import Any, Dict, List, Optional

EXIT = -1

#: hidden local holding a function's return value
RET_VAR = "__ret"


@dataclass
class BlockNode:
    id: int
    name: str  # e.g. "buy_item_0" — paper-style split-function name
    params: List[str]
    defines: List[str]
    source: str  # generated def source (paper-style, for display/tests)
    next: int = EXIT
    kind: str = "block"


@dataclass
class RemoteCallNode:
    id: int
    call_kind: str  # "call" | "get" | "create"
    #: method name for call/get; entity class name for create
    method: str
    call_id: int  # K in __call_K_target / __call_K_args
    result_var: str
    next: int = EXIT
    kind: str = "remote"


@dataclass
class CondNode:
    id: int
    test_src: str
    true_next: int = EXIT
    false_next: int = EXIT
    kind: str = "cond"


@dataclass
class ForNode:
    id: int
    loop_var: str
    iter_var: str
    idx_var: str
    body_next: int = EXIT
    after_next: int = EXIT
    kind: str = "for"


Node = Any  # union of the four dataclasses


@dataclass
class StateMachine:
    """The compiled form of one method."""

    class_name: str
    method: str
    entry: int
    nodes: Dict[int, Node] = field(default_factory=dict)
    eligible: bool = True
    #: for non-eligible (simple) methods: the single plain function source
    simple_source: Optional[str] = None
    param_names: List[str] = field(default_factory=list)
    param_defaults: Dict[str, Any] = field(default_factory=dict)

    def blocks(self) -> List[BlockNode]:
        return [n for n in self.nodes.values() if isinstance(n, BlockNode)]

    def remote_nodes(self) -> List[RemoteCallNode]:
        return [
            n for n in self.nodes.values() if isinstance(n, RemoteCallNode)
        ]

    # -- serialization ---------------------------------------------------

    def to_json(self) -> dict:
        return {
            "class_name": self.class_name,
            "method": self.method,
            "entry": self.entry,
            "eligible": self.eligible,
            "simple_source": self.simple_source,
            "param_names": self.param_names,
            "param_defaults": self.param_defaults,
            "nodes": {str(i): _node_to_json(n) for i, n in self.nodes.items()},
        }

    @staticmethod
    def from_json(obj: dict) -> "StateMachine":
        sm = StateMachine(
            class_name=obj["class_name"],
            method=obj["method"],
            entry=obj["entry"],
            eligible=obj["eligible"],
            simple_source=obj.get("simple_source"),
            param_names=list(obj.get("param_names", [])),
            param_defaults=dict(obj.get("param_defaults", {})),
        )
        sm.nodes = {
            int(i): _node_from_json(n) for i, n in obj["nodes"].items()
        }
        return sm


def _node_to_json(n: Node) -> dict:
    d = dict(n.__dict__)
    return d


def _node_from_json(d: dict) -> Node:
    kind = d["kind"]
    d = dict(d)
    if kind == "block":
        d.pop("kind")
        return BlockNode(kind="block", **d)
    if kind == "remote":
        d.pop("kind")
        return RemoteCallNode(kind="remote", **d)
    if kind == "cond":
        d.pop("kind")
        return CondNode(kind="cond", **d)
    if kind == "for":
        d.pop("kind")
        return ForNode(kind="for", **d)
    raise ValueError(f"unknown node kind {kind!r}")
