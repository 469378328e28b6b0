"""Latency / throughput measurement harness (experiments T2, T3).

Open-loop driver: requests are submitted on a fixed schedule (the target
RPS), never waiting for earlier responses — the standard way to measure
latency under load without coordinated omission. Per-request latency is
``response-routed-time − submit-time``; runtimes that record the
response arrival timestamp (streaming, FaaS) are preferred over the
client-side ``result()`` return time.
"""
from __future__ import annotations

import time
from dataclasses import dataclass
from typing import Any, Dict, List, Optional, Sequence, Tuple

import numpy as np

from repro.deathstar.workload import Request
from repro.runtimes.base import Runtime


@dataclass
class LatencyStats:
    n: int
    ok: int
    avg_ms: float
    p50_ms: float
    p99_ms: float
    max_ms: float

    @staticmethod
    def from_values(values: Sequence[float], ok: Optional[int] = None) -> "LatencyStats":
        if not values:
            return LatencyStats(0, 0, float("nan"), float("nan"), float("nan"), float("nan"))
        arr = np.asarray(values, dtype=float)
        return LatencyStats(
            n=len(arr),
            ok=len(arr) if ok is None else ok,
            avg_ms=float(arr.mean()),
            p50_ms=float(np.percentile(arr, 50)),
            p99_ms=float(np.percentile(arr, 99)),
            max_ms=float(arr.max()),
        )


@dataclass
class Measured:
    request: Request
    latency_ms: float
    ok: bool


def run_open_loop(
    runtime: Runtime,
    requests: List[Request],
    rps: float,
    *,
    timeout: float = 300.0,
) -> List[Measured]:
    """Submit ``requests`` at ``rps``, await all, return per-request
    latencies. Wall-clock of the submission phase is len/rps."""
    interval = 1.0 / rps
    submitted: List[Tuple[Request, str, float]] = []
    t_start = time.time()
    for i, req in enumerate(requests):
        target = t_start + i * interval
        delay = target - time.time()
        if delay > 0:
            time.sleep(delay)
        t_submit = time.time() * 1000.0
        rid = runtime.submit_call(req.class_name, req.key, req.method, req.args)
        submitted.append((req, rid, t_submit))
    out: List[Measured] = []
    for req, rid, t_submit in submitted:
        ok = True
        try:
            runtime.result(rid, timeout=timeout)
        except Exception:  # noqa: BLE001 - errors recorded, not raised
            ok = False
        t_done = None
        getter = getattr(runtime, "response_time_ms", None)
        if getter is not None:
            t_done = getter(rid)
        if t_done is None:
            t_done = time.time() * 1000.0
        out.append(Measured(req, max(0.0, t_done - t_submit), ok))
    return out


def stats_by_endpoint(measured: List[Measured]) -> Dict[str, LatencyStats]:
    by: Dict[str, List[float]] = {}
    ok_by: Dict[str, int] = {}
    for m in measured:
        by.setdefault(m.request.endpoint, []).append(m.latency_ms)
        ok_by[m.request.endpoint] = ok_by.get(m.request.endpoint, 0) + (
            1 if m.ok else 0
        )
    return {
        e: LatencyStats.from_values(v, ok=ok_by.get(e, 0))
        for e, v in by.items()
    }


def overall_stats(measured: List[Measured]) -> LatencyStats:
    return LatencyStats.from_values(
        [m.latency_ms for m in measured],
        ok=sum(1 for m in measured if m.ok),
    )


def format_table(rows: List[Dict[str, Any]], columns: List[str]) -> str:
    """Plain fixed-width table for stdout + EXPERIMENTS.md."""
    widths = {
        c: max(len(c), *(len(_fmt(r.get(c, ""))) for r in rows)) if rows else len(c)
        for c in columns
    }
    lines = [
        "  ".join(c.ljust(widths[c]) for c in columns),
        "  ".join("-" * widths[c] for c in columns),
    ]
    for r in rows:
        lines.append(
            "  ".join(_fmt(r.get(c, "")).ljust(widths[c]) for c in columns)
        )
    return "\n".join(lines)


def _fmt(v: Any) -> str:
    if isinstance(v, float):
        return f"{v:.1f}"
    return str(v)


def emit(line: str) -> None:
    """Print a result row and mirror it to bench_rows.txt.

    pytest captures stdout of passing tests, so benchmark rows would be
    invisible in a plain ``pytest benchmarks/ --benchmark-only`` run;
    the mirror file (next to the repo root, overwritten per pytest
    session via an env marker) keeps the rows inspectable.
    """
    import os

    print("\n" + line)
    path = os.environ.get("REPRO_ROWS_FILE", "bench_rows.txt")
    mode = "a" if os.environ.get("_REPRO_ROWS_STARTED") else "w"
    os.environ["_REPRO_ROWS_STARTED"] = "1"
    with open(path, mode) as f:
        f.write(line + "\n")
