"""Stateful-entity programming model (paper §2.1).

Programmers annotate plain Python classes with :func:`stateflow`. The
decorator performs **no** rewriting: the class remains directly usable as
ordinary Python (that un-compiled class is the semantic oracle in the
tests). Compilation happens lazily, once all classes are registered, via
:func:`repro.core.ir.build_ir`.

A :class:`Ref` is the runtime representation of a reference to a stateful
entity — the pair ``(class_name, key)``. Refs are what travel inside
events and what application code passes around instead of live objects.
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Any, Dict, Type

#: Global registry of @stateflow-annotated classes: name -> class object.
REGISTRY: Dict[str, Type] = {}


def stateflow(cls: type) -> type:
    """Class decorator marking ``cls`` as a stateful entity.

    Registers the class under its ``__name__`` and returns it unchanged.
    Re-registering the same name replaces the previous entry (convenient
    for test modules that redefine example classes).
    """
    REGISTRY[cls.__name__] = cls
    cls.__stateflow__ = True
    return cls


def clear_registry() -> None:
    """Remove all registered entity classes (test isolation helper)."""
    REGISTRY.clear()


@dataclass(frozen=True)
class Ref:
    """A serializable reference to a stateful entity instance."""

    class_name: str
    key: Any

    def to_json(self) -> dict:
        return {"__ref__": [self.class_name, self.key]}

    @staticmethod
    def from_json(obj: dict) -> "Ref":
        cls_name, key = obj["__ref__"]
        return Ref(cls_name, key)

    def __repr__(self) -> str:  # compact, stable repr used in test output
        return f"Ref({self.class_name}/{self.key})"


def ref_of(obj: Any) -> Ref:
    """Build a :class:`Ref` from a live (un-compiled) entity instance.

    Uses the instance's ``__key__()``; only valid for @stateflow classes.
    """
    if not getattr(type(obj), "__stateflow__", False):
        raise TypeError(f"{type(obj).__name__} is not a @stateflow class")
    return Ref(type(obj).__name__, obj.__key__())
