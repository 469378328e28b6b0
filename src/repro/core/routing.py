"""Ingress / egress routers (paper §2.2).

The *ingress router* performs the keyBy: it maps an event to the
partition key ``(class_name, key)`` so it reaches the operator partition
holding that entity's state. The *egress router* decides whether an
operator output leaves the dataflow (RESPONSE → client) or loops back in
to invoke another function (CALL / RETURN) — the paper loops through
Kafka because most streaming systems do not support cyclic dataflows;
our runtimes loop through their respective event buses.
"""
from __future__ import annotations

from typing import List, Tuple

from repro.core.events import RESPONSE, Event


def partition_key(event: Event) -> Tuple[str, str]:
    """Ingress: the keyBy key for an event (class name + entity key)."""
    return (event.class_name, str(event.key))


def is_client_bound(event: Event) -> bool:
    """Egress: True if the event leaves the dataflow toward the client."""
    return event.kind == RESPONSE


def split_outputs(events: List[Event]) -> Tuple[List[Event], List[Event]]:
    """Egress: partition outputs into (loop-back events, client responses)."""
    loop = [e for e in events if not is_client_bound(e)]
    out = [e for e in events if is_client_bound(e)]
    return loop, out
