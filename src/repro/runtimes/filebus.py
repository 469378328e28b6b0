"""Directory-topic event bus — the Kafka substitute (DESIGN.md).

The paper uses Kafka both as the dataflow source/sink and to *re-enter*
events into the acyclic streaming graph ("StateFlow uses Kafka to
reenter the event to the streaming dataflow thereby avoiding cyclic
dataflows"). Here a topic is a directory of JSON-lines files that a
Spark file streaming source tails; publishing writes a temp file and
atomically renames it in (the file source requires atomic appearance).
"""
from __future__ import annotations

import os
import tempfile
import threading
import uuid
from typing import Iterable, List

from repro.core.events import Event


class FileTopic:
    def __init__(self, path: str):
        self.path = path
        os.makedirs(path, exist_ok=True)
        self._lock = threading.Lock()
        self._seq = 0

    def publish(self, events: Iterable[Event]) -> int:
        """Atomically append a batch of events to the topic."""
        events = list(events)
        if not events:
            return 0
        with self._lock:
            self._seq += 1
            seq = self._seq
        name = f"batch-{seq:08d}-{uuid.uuid4().hex[:8]}.json"
        fd, tmp = tempfile.mkstemp(dir=self.path, suffix=".tmp")
        try:
            with os.fdopen(fd, "w") as f:
                for ev in events:
                    f.write(ev.to_json_line())
                    f.write("\n")
            os.rename(tmp, os.path.join(self.path, name))
        finally:
            if os.path.exists(tmp):
                os.unlink(tmp)
        return len(events)

    def read_all(self) -> List[Event]:
        """Read every event in the topic (test helper, not streaming)."""
        out: List[Event] = []
        for name in sorted(os.listdir(self.path)):
            if not name.endswith(".json"):
                continue
            with open(os.path.join(self.path, name)) as f:
                for line in f:
                    line = line.strip()
                    if line:
                        out.append(Event.from_json_line(line))
        return out

    def file_count(self) -> int:
        return sum(1 for n in os.listdir(self.path) if n.endswith(".json"))
