"""JSON value serde with entity-reference support.

All values that cross an event hop (function arguments, return values,
block locals, entity state) must be JSON-serializable (paper §2.1's
serializability assumption). :class:`repro.core.entities.Ref` objects are
encoded as ``{"__ref__": [class_name, key]}`` and revived on decode.

Tuples become lists across a hop — a documented consequence of the JSON
substrate, equivalent to the paper's immutability assumption.
"""
from __future__ import annotations

import json
from typing import Any

from repro.core.entities import Ref


def _encode(value: Any) -> Any:
    if isinstance(value, Ref):
        return value.to_json()
    if isinstance(value, dict):
        return {k: _encode(v) for k, v in value.items()}
    if isinstance(value, (list, tuple)):
        return [_encode(v) for v in value]
    return value


def _decode(value: Any) -> Any:
    if isinstance(value, dict):
        if "__ref__" in value and len(value) == 1:
            return Ref.from_json(value)
        return {k: _decode(v) for k, v in value.items()}
    if isinstance(value, list):
        return [_decode(v) for v in value]
    return value


def dumps(value: Any) -> str:
    """Serialize ``value`` (with Refs) to a JSON string."""
    return json.dumps(_encode(value), separators=(",", ":"))


def loads(text: str) -> Any:
    """Deserialize a JSON string produced by :func:`dumps`."""
    return _decode(json.loads(text))
