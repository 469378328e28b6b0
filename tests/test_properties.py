"""Property-based tests (hypothesis): serde, execution-graph and event
roundtrips hold for arbitrary JSON-shaped values; the used/defined scan
is consistent for generated straight-line blocks; latency statistics
match a NumPy reference."""
import ast
import keyword

import numpy as np
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.bench.harness import LatencyStats
from repro.core import serde
from repro.core.entities import Ref
from repro.core.events import FIELDS, Event
from repro.core.exec_graph import ExecutionGraph, Frame
from repro.core.split import _scan_used_defined

# JSON-shaped values, with Refs sprinkled in
json_scalars = st.one_of(
    st.none(),
    st.booleans(),
    st.integers(min_value=-(2**31), max_value=2**31),
    st.floats(allow_nan=False, allow_infinity=False, width=32),
    st.text(max_size=20),
    st.builds(
        Ref,
        st.text(min_size=1, max_size=8),
        st.text(min_size=1, max_size=8),
    ),
)
json_values = st.recursive(
    json_scalars,
    lambda children: st.one_of(
        st.lists(children, max_size=4),
        st.dictionaries(st.text(max_size=8), children, max_size=4),
    ),
    max_leaves=12,
)


def _listify(v):
    """Expected serde normalization (tuples→lists) for comparison."""
    if isinstance(v, (list, tuple)):
        return [_listify(x) for x in v]
    if isinstance(v, dict):
        return {k: _listify(x) for k, x in v.items()}
    return v


class TestSerdeProperties:
    @given(json_values)
    @settings(max_examples=200, deadline=None)
    def test_roundtrip(self, value):
        assert serde.loads(serde.dumps(value)) == _listify(value)

    @given(json_values)
    @settings(max_examples=50, deadline=None)
    def test_double_roundtrip_stable(self, value):
        once = serde.loads(serde.dumps(value))
        twice = serde.loads(serde.dumps(once))
        assert once == twice

    @given(st.lists(json_scalars, max_size=5), st.text(min_size=1, max_size=10))
    @settings(max_examples=100, deadline=None)
    def test_event_row_roundtrip(self, args, rid):
        e = Event.call("C", "k", "m", args, request_id=rid)
        back = Event(**dict(zip(FIELDS, e.to_row())))
        assert back.args == _listify(args)
        assert back.request_id == rid

    @given(
        st.lists(
            st.tuples(
                st.text(min_size=1, max_size=6),
                st.text(min_size=1, max_size=6),
                st.integers(min_value=-1, max_value=50),
                st.dictionaries(
                    st.text(min_size=1, max_size=6), json_scalars, max_size=3
                ),
            ),
            max_size=4,
        )
    )
    @settings(max_examples=100, deadline=None)
    def test_exec_graph_roundtrip(self, frames):
        g = ExecutionGraph(
            frames=[Frame(c, k, "m", n, dict(loc)) for c, k, n, loc in frames]
        )
        back = ExecutionGraph.from_json(g.to_json())
        assert back.depth == len(frames)
        for f, (c, k, n, loc) in zip(back.frames, frames):
            assert (f.class_name, f.method, f.node) == (c, "m", n)
            assert f.locals == _listify(dict(loc))


_idents = st.from_regex(r"[a-z][a-z0-9_]{0,5}", fullmatch=True).filter(
    lambda s: not keyword.iskeyword(s)
)


class TestScanProperties:
    @given(
        st.lists(
            st.tuples(_idents, st.lists(_idents, max_size=3)), min_size=1,
            max_size=6,
        )
    )
    @settings(max_examples=150, deadline=None)
    def test_straightline_assignments(self, assignments):
        """For `t = a + b + ...` chains: every name read before it is
        written appears in `used`; every written name is in `defined`;
        the two views are consistent with a direct simulation."""
        lines = []
        for target, operands in assignments:
            rhs = " + ".join(operands) if operands else "0"
            lines.append(f"{target} = {rhs}")
        src = "\n".join(lines)
        stmts = ast.parse(src).body
        local_names = {t for t, _ in assignments} | {
            o for _, ops in assignments for o in ops
        }
        used, defined = _scan_used_defined(stmts, local_names)
        # simulate
        sim_defined, sim_used = set(), []
        for target, operands in assignments:
            for o in operands:
                if o not in sim_defined and o not in sim_used:
                    sim_used.append(o)
            sim_defined.add(target)
        assert used == sim_used
        assert set(defined) == sim_defined

    @given(st.lists(_idents, min_size=1, max_size=5, unique=True))
    @settings(max_examples=50, deadline=None)
    def test_params_never_include_defined_first(self, names):
        src = "\n".join(f"{n} = 1" for n in names)
        used, defined = _scan_used_defined(
            ast.parse(src).body, set(names)
        )
        assert used == []
        assert defined == list(names)


class TestStatsProperties:
    @given(
        st.lists(
            st.floats(min_value=0.0, max_value=1e6, allow_nan=False),
            min_size=1,
            max_size=200,
        )
    )
    @settings(max_examples=100, deadline=None)
    def test_stats_match_numpy(self, values):
        s = LatencyStats.from_values(values)
        arr = np.asarray(values)
        assert s.n == len(values)
        assert s.avg_ms == float(arr.mean())
        assert s.p50_ms == float(np.percentile(arr, 50))
        assert s.p99_ms == float(np.percentile(arr, 99))
        assert s.max_ms == float(arr.max())
        assert s.p50_ms <= s.p99_ms <= s.max_ms
