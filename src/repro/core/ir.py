"""The StateFlow intermediate representation (paper §2.3 "Intermediate
representation").

``build_ir`` runs the full compiler pipeline over a set of @stateflow
classes and produces a :class:`DataflowIR`:

* one :class:`OperatorIR` per class — the dataflow *operator*: it holds
  the class's state schema, key variable and the compiled state machine
  of every method (paper Table 1: Class → Operator);
* **edges** between operators derived from the remote references found
  during normalization, plus the implicit ``ingress``/``egress`` router
  nodes;
* everything is JSON-serializable: generated block sources (not code
  objects) ship to Spark executors, which re-compile them locally
  (:mod:`repro.core.worker`).
"""
from __future__ import annotations

import json
from dataclasses import dataclass, field
from typing import Dict, List, Optional, Set, Tuple

from repro.core import entities
from repro.core.analysis import (
    ClassDescriptor,
    CompileError,
    analyze_class,
)
from repro.core.normalize import normalize_method
from repro.core.split import split_method
from repro.core.statemachine import StateMachine

INGRESS = "__ingress__"
EGRESS = "__egress__"


@dataclass
class OperatorIR:
    class_name: str
    state_vars: Dict[str, str]  # name -> declared type text
    key_var: str
    #: position of the key parameter in __init__ (for routing creations)
    key_param_index: int
    machines: Dict[str, StateMachine]  # method name -> compiled machine

    def simple_methods(self) -> List[str]:
        return [m for m, sm in self.machines.items() if not sm.eligible]

    def split_methods(self) -> List[str]:
        return [m for m, sm in self.machines.items() if sm.eligible]

    def to_json(self) -> dict:
        return {
            "class_name": self.class_name,
            "state_vars": self.state_vars,
            "key_var": self.key_var,
            "key_param_index": self.key_param_index,
            "machines": {m: sm.to_json() for m, sm in self.machines.items()},
        }

    @staticmethod
    def from_json(obj: dict) -> "OperatorIR":
        return OperatorIR(
            class_name=obj["class_name"],
            state_vars=dict(obj["state_vars"]),
            key_var=obj["key_var"],
            key_param_index=obj["key_param_index"],
            machines={
                m: StateMachine.from_json(sm)
                for m, sm in obj["machines"].items()
            },
        )


@dataclass
class DataflowIR:
    operators: Dict[str, OperatorIR]
    #: operator-to-operator edges (caller class -> callee class)
    edges: Set[Tuple[str, str]] = field(default_factory=set)

    def dataflow_nodes(self) -> List[str]:
        """All vertices of the dataflow graph, routers included."""
        return [INGRESS, *sorted(self.operators), EGRESS]

    def dataflow_edges(self) -> Set[Tuple[str, str]]:
        """Operator edges plus ingress fan-out and egress fan-in."""
        e = set(self.edges)
        for op in self.operators:
            e.add((INGRESS, op))
            e.add((op, EGRESS))
        return e

    def to_json(self) -> str:
        return json.dumps(
            {
                "operators": {
                    n: op.to_json() for n, op in self.operators.items()
                },
                "edges": sorted(list(e) for e in self.edges),
            }
        )

    @staticmethod
    def from_json(text: str) -> "DataflowIR":
        obj = json.loads(text)
        return DataflowIR(
            operators={
                n: OperatorIR.from_json(o)
                for n, o in obj["operators"].items()
            },
            edges={(a, b) for a, b in obj["edges"]},
        )


def build_ir(classes: Optional[List[type]] = None) -> DataflowIR:
    """Compile ``classes`` (default: the whole registry) into the IR."""
    classes = classes if classes is not None else list(
        entities.REGISTRY.values()
    )
    entity_names = {c.__name__ for c in classes}
    descs: Dict[str, ClassDescriptor] = {
        c.__name__: analyze_class(c, entity_names) for c in classes
    }
    members = {
        n: (set(d.methods) - {"__init__"}, set(d.state_vars))
        for n, d in descs.items()
    }
    operators: Dict[str, OperatorIR] = {}
    edges: Set[Tuple[str, str]] = set()
    for name, desc in descs.items():
        machines: Dict[str, StateMachine] = {}
        norm_by_method = {}
        for mname, minfo in desc.methods.items():
            norm = normalize_method(desc, minfo, entity_names, members)
            norm_by_method[mname] = norm
            machines[mname] = split_method(desc, minfo, norm)
            for callee in norm.remote_classes:
                edges.add((name, callee))
        _check_self_calls(desc, norm_by_method)
        init_params = [p.name for p in desc.methods["__init__"].params]
        if desc.key_var not in init_params:
            raise CompileError(
                f"{name}: key var '{desc.key_var}' is not an __init__ "
                "parameter"
            )
        operators[name] = OperatorIR(
            class_name=name,
            state_vars={n: t.text for n, t in desc.state_vars.items()},
            key_var=desc.key_var,
            key_param_index=init_params.index(desc.key_var),
            machines=machines,
        )
    return DataflowIR(operators=operators, edges=edges)


def _check_self_calls(desc: ClassDescriptor, norms: Dict[str, object]) -> None:
    """``self.m(...)`` is a local call — only allowed to *simple* methods.

    A self-call to a split method would need its own suspension frame on
    the same operator; the paper routes those through the dataflow, which
    our programming model expresses by calling through an explicit Ref.
    """
    import ast

    eligible = {m for m, n in norms.items() if getattr(n, "eligible", False)}
    for mname, norm in norms.items():
        for stmt in norm.body:  # type: ignore[attr-defined]
            for sub in ast.walk(stmt):
                if (
                    isinstance(sub, ast.Call)
                    and isinstance(sub.func, ast.Attribute)
                    and isinstance(sub.func.value, ast.Name)
                    and sub.func.value.id == "self"
                    and sub.func.attr in eligible
                ):
                    raise CompileError(
                        f"{desc.name}.{mname}: self-call to split method "
                        f"'{sub.func.attr}'; split methods must be invoked "
                        "through an entity Ref"
                    )
