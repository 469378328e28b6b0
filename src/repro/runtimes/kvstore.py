"""External key-value state store — the DynamoDB substitute (DESIGN.md).

The paper's FaaS target keeps entity state in DynamoDB and explicitly
runs **without locking** ("locking was found to deteriorate performance
significantly and therefore it was disabled"). This store mirrors that:
it provides atomic single-key get/put (sqlite serializes individual
statements) but **no** read-modify-write protection, so two concurrent
invocations of the same entity can interleave and lose updates — the
paper's documented consistency gap, reproduced and tested.

Backed by a sqlite file so reads/writes pay a real storage roundtrip
(WAL mode, one connection per thread).
"""
from __future__ import annotations

import os
import sqlite3
import tempfile
import threading
from typing import Dict, Iterator, Optional, Tuple


class KVStore:
    def __init__(self, path: Optional[str] = None):
        if path is None:
            fd, path = tempfile.mkstemp(suffix=".kv.sqlite")
            os.close(fd)
            self._own_file = True
        else:
            self._own_file = False
        self.path = path
        self._local = threading.local()
        with self._conn() as c:
            c.execute(
                "CREATE TABLE IF NOT EXISTS kv "
                "(k TEXT PRIMARY KEY, v TEXT NOT NULL)"
            )

    def _conn(self) -> sqlite3.Connection:
        c = getattr(self._local, "conn", None)
        if c is None:
            c = sqlite3.connect(self.path, timeout=30.0)
            c.execute("PRAGMA journal_mode=WAL")
            c.execute("PRAGMA synchronous=NORMAL")
            self._local.conn = c
        return c

    @staticmethod
    def _key(class_name: str, key: str) -> str:
        return f"{class_name}\x00{key}"

    def get(self, class_name: str, key: str) -> Optional[str]:
        cur = self._conn().execute(
            "SELECT v FROM kv WHERE k = ?", (self._key(class_name, key),)
        )
        row = cur.fetchone()
        return row[0] if row else None

    def put(self, class_name: str, key: str, value: str) -> None:
        c = self._conn()
        c.execute(
            "INSERT INTO kv (k, v) VALUES (?, ?) "
            "ON CONFLICT(k) DO UPDATE SET v = excluded.v",
            (self._key(class_name, key), value),
        )
        c.commit()

    def delete(self, class_name: str, key: str) -> None:
        c = self._conn()
        c.execute("DELETE FROM kv WHERE k = ?", (self._key(class_name, key),))
        c.commit()

    def items(self) -> Iterator[Tuple[str, str, str]]:
        cur = self._conn().execute("SELECT k, v FROM kv")
        for k, v in cur.fetchall():
            cls, key = k.split("\x00", 1)
            yield cls, key, v

    def count(self) -> int:
        return self._conn().execute("SELECT COUNT(*) FROM kv").fetchone()[0]

    def close(self) -> None:
        c = getattr(self._local, "conn", None)
        if c is not None:
            c.close()
            self._local.conn = None
        if self._own_file and os.path.exists(self.path):
            try:
                os.unlink(self.path)
                for suffix in ("-wal", "-shm"):
                    p = self.path + suffix
                    if os.path.exists(p):
                        os.unlink(p)
            except OSError:
                pass
