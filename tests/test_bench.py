"""Bench-harness module tests: latency statistics, the open-loop
driver, the overhead instrumentation (T4), and the LOC counter (T5)."""
import textwrap

import pytest

from repro.bench.harness import (
    LatencyStats,
    Measured,
    format_table,
    overall_stats,
    run_open_loop,
    stats_by_endpoint,
)
from repro.bench.loc import count_loc, count_loc_by_section, loc_report
from repro.bench.overhead import (
    APP_COMPONENTS,
    SERDE_COMPONENTS,
    STATEFLOW_COMPONENTS,
    STORE_COMPONENTS,
    Blob,
    blob_ir,
    measure_overhead,
)
from repro.core.ir import build_ir
from repro.deathstar.workload import Request
from repro.runtimes.local import LocalRuntime

from tests.zoo import ZOO_CLASSES


class TestLatencyStats:
    def test_from_values(self):
        s = LatencyStats.from_values([1.0, 2.0, 3.0, 4.0])
        assert s.n == 4
        assert s.avg_ms == pytest.approx(2.5)
        assert s.p50_ms == pytest.approx(2.5)
        assert s.max_ms == 4.0

    def test_p99_tail(self):
        vals = [1.0] * 90 + [100.0] * 10
        s = LatencyStats.from_values(vals)
        assert s.p99_ms == pytest.approx(100.0)
        assert s.p50_ms == pytest.approx(1.0)

    def test_empty(self):
        s = LatencyStats.from_values([])
        assert s.n == 0

    def test_stats_by_endpoint(self):
        ms = [
            Measured(Request("a", "C", "k", "m", []), 10.0, True),
            Measured(Request("a", "C", "k", "m", []), 20.0, True),
            Measured(Request("b", "C", "k", "m", []), 5.0, False),
        ]
        by = stats_by_endpoint(ms)
        assert by["a"].n == 2 and by["a"].avg_ms == 15.0
        assert by["b"].ok == 0
        assert overall_stats(ms).n == 3

    def test_format_table(self):
        out = format_table(
            [{"a": 1, "b": 2.5}, {"a": 10, "b": 0.123}], ["a", "b"]
        )
        lines = out.splitlines()
        assert len(lines) == 4
        assert lines[0].startswith("a")
        assert "0.1" in lines[3]


class TestOpenLoop:
    def test_against_local_runtime(self):
        rt = LocalRuntime()
        rt.deploy(build_ir(ZOO_CLASSES))
        rt.seed("Acc", "a1", {"accid": "a1", "total": 0})
        reqs = [
            Request("add", "Acc", "a1", "add", [1]) for _ in range(10)
        ]
        measured = run_open_loop(rt, reqs, rps=200.0)
        assert len(measured) == 10
        assert all(m.ok for m in measured)
        assert all(m.latency_ms >= 0 for m in measured)
        assert rt.get_state("Acc", "a1")["total"] == 10

    def test_errors_marked_not_ok(self):
        rt = LocalRuntime()
        rt.deploy(build_ir(ZOO_CLASSES))
        reqs = [Request("x", "Acc", "ghost", "peek", [])]
        measured = run_open_loop(rt, reqs, rps=100.0)
        assert not measured[0].ok


class TestOverhead:
    def test_blob_ir_compiles(self):
        ir = blob_ir()
        assert "Blob" in ir.operators

    def test_measure_components_present(self):
        row = measure_overhead(state_kb=50, n_events=20)
        assert row.total_us > 0
        for c in ("construct", "execute", "state_ser", "state_deser"):
            assert c in row.components_us
        assert "store_read" in row.components_us
        assert "store_write" in row.components_us

    def test_components_do_not_exceed_total(self):
        row = measure_overhead(state_kb=50, n_events=20)
        assert sum(row.components_us.values()) <= row.total_us * 1.05

    def test_stateflow_share_is_small(self):
        """The paper's conclusion: StateFlow itself is a tiny fraction
        of per-event cost (<1% there; we assert an order-of-magnitude
        bound here and report the measured figure in the bench)."""
        row = measure_overhead(state_kb=100, n_events=50)
        assert row.stateflow_pct < 15.0

    def test_serde_grows_with_state_size(self):
        small = measure_overhead(state_kb=50, n_events=30, use_store=False)
        large = measure_overhead(state_kb=200, n_events=30, use_store=False)
        assert large.pct(SERDE_COMPONENTS) >= small.pct(SERDE_COMPONENTS) * 0.5
        assert (
            sum(large.components_us[c] for c in SERDE_COMPONENTS)
            > sum(small.components_us[c] for c in SERDE_COMPONENTS)
        )

    def test_component_classification_disjoint(self):
        groups = [
            set(STATEFLOW_COMPONENTS),
            set(SERDE_COMPONENTS),
            set(STORE_COMPONENTS),
            set(APP_COMPONENTS),
        ]
        for i, a in enumerate(groups):
            for b in groups[i + 1:]:
                assert not (a & b)

    def test_blob_direct_python(self):
        b = Blob("b", "xx")
        assert b.bump(3) == 3
        assert b.bump(1) == 4


class TestLoc:
    def test_count_loc_basic(self, tmp_path):
        p = tmp_path / "m.py"
        p.write_text(
            textwrap.dedent(
                '''
                """module docstring
                spanning lines"""
                # a comment

                x = 1

                def f():
                    """doc"""
                    return x
                '''
            )
        )
        assert count_loc(str(p)) == 3  # x=1, def f, return x

    def test_count_by_section(self, tmp_path):
        p = tmp_path / "m.py"
        p.write_text(
            "a = 1\n"
            "# === infrastructure: serde ===\n"
            "b = 2\n"
            "c = 3\n"
            "# === business logic ===\n"
            "d = 4\n"
        )
        by = count_loc_by_section(str(p))
        assert by == {"header": 1, "infrastructure": 2, "business": 1}

    def test_report_shape_matches_paper(self):
        """T5 invariants: entities stay near the paper's ±200 LOC; the
        explicit baseline is substantially larger with a significant
        infrastructure share; runtime adapters sit in the paper's
        87–169 LOC ballpark."""
        r = loc_report()
        assert 120 <= r.stateflow_loc <= 260
        assert r.baseline_total > 1.5 * r.stateflow_loc
        assert 20.0 <= r.baseline_infra_pct <= 60.0
        for name, loc in r.adapter_loc.items():
            assert 40 <= loc <= 260, (name, loc)
