"""Execution graph carried inside events (paper §2.3).

The paper copies an *execution graph* into each event: it tracks which
stage of a split function is executing and stores intermediate results
(the values of variables defined by earlier blocks, which later blocks
look up — paper: "the execution graph is traversed in reverse order to
find the value of total_price").

We represent it as a stack of :class:`Frame` objects — one per active
function invocation across entities. ``frame.locals`` is exactly the
"intermediate results" store; ``frame.node`` is the state-machine node
to (re-)enter. The top frame is the one currently executing; frames
below it are suspended callers awaiting RETURN events.

Because the graph travels *inside* events, suspended callers keep no
continuation data in operator state — when the RETURN arrives, the
caller entity's state is re-read, reproducing the paper's documented
consistency caveat for split functions.
"""
from __future__ import annotations

from dataclasses import dataclass, field
from typing import Any, Dict, List

from repro.core import serde


@dataclass
class Frame:
    class_name: str
    key: Any
    method: str
    node: int  # state-machine node id to (re-)enter
    locals: Dict[str, Any] = field(default_factory=dict)


@dataclass
class ExecutionGraph:
    frames: List[Frame] = field(default_factory=list)

    @property
    def top(self) -> Frame:
        return self.frames[-1]

    @property
    def depth(self) -> int:
        return len(self.frames)

    def push(self, frame: Frame) -> None:
        self.frames.append(frame)

    def pop(self) -> Frame:
        return self.frames.pop()

    # -- serde -----------------------------------------------------------

    def to_json(self) -> str:
        return serde.dumps(
            [
                {
                    "class_name": f.class_name,
                    "key": f.key,
                    "method": f.method,
                    "node": f.node,
                    "locals": f.locals,
                }
                for f in self.frames
            ]
        )

    @staticmethod
    def from_json(text: str) -> "ExecutionGraph":
        if not text:
            return ExecutionGraph()
        raw = serde.loads(text)
        return ExecutionGraph(
            frames=[
                Frame(
                    class_name=f["class_name"],
                    key=f["key"],
                    method=f["method"],
                    node=f["node"],
                    locals=f["locals"],
                )
                for f in raw
            ]
        )
