"""Semantic parity: compiled execution on the Local runtime must match
direct plain-Python execution for every zoo scenario (paper §3 "Local":
the local target exists precisely so programs behave like ordinary
Python for debugging/unit tests)."""
import pytest

from repro.core.entities import Ref
from repro.core.ir import build_ir
from repro.runtimes.base import EntityError
from repro.runtimes.local import LocalRuntime

from tests.zoo import (
    SCENARIO_IDS,
    SCENARIOS,
    ZOO_CLASSES,
    assert_same_world,
    run_oracle,
    run_runtime,
)


@pytest.fixture(scope="module")
def zoo_ir():
    return build_ir(ZOO_CLASSES)


def fresh_runtime(zoo_ir) -> LocalRuntime:
    rt = LocalRuntime()
    rt.deploy(zoo_ir)
    return rt


@pytest.mark.parametrize(("method", "args"), SCENARIOS, ids=SCENARIO_IDS)
def test_parity_with_plain_python(zoo_ir, method, args):
    rt = fresh_runtime(zoo_ir)
    assert_same_world(run_oracle(method, args), run_runtime(rt, method, args))


def test_error_propagates_as_entity_error(zoo_ir):
    rt = fresh_runtime(zoo_ir)
    rt.create("Acc", "a1")
    rt.create("Driver", "d1", Ref("Acc", "a1"))
    with pytest.raises(EntityError, match="ValueError: boom"):
        rt.call("Driver", "d1", "call_fail", "boom")


def test_error_in_simple_method(zoo_ir):
    rt = fresh_runtime(zoo_ir)
    rt.create("Acc", "a1")
    with pytest.raises(EntityError, match="ValueError: direct"):
        rt.call("Acc", "a1", "fail", "direct")


def test_call_on_missing_entity(zoo_ir):
    rt = fresh_runtime(zoo_ir)
    with pytest.raises(EntityError, match="no entity"):
        rt.call("Acc", "ghost", "peek")


def test_double_create_rejected(zoo_ir):
    rt = fresh_runtime(zoo_ir)
    rt.create("Acc", "a1")
    with pytest.raises(EntityError, match="already exists"):
        rt.create("Acc", "a1")


def test_unknown_method_rejected(zoo_ir):
    rt = fresh_runtime(zoo_ir)
    rt.create("Acc", "a1")
    with pytest.raises(EntityError, match="no method"):
        rt.call("Acc", "a1", "nope")


def test_missing_argument_rejected(zoo_ir):
    rt = fresh_runtime(zoo_ir)
    rt.create("Acc", "a1")
    with pytest.raises(EntityError, match="missing argument"):
        rt.call("Acc", "a1", "add")


def test_state_survives_many_calls(zoo_ir):
    rt = fresh_runtime(zoo_ir)
    rt.create("Acc", "a1")
    for i in range(50):
        assert rt.call("Acc", "a1", "add", 1) == i + 1
    assert rt.get_state("Acc", "a1")["total"] == 50


def test_default_args_fill(zoo_ir):
    rt = fresh_runtime(zoo_ir)
    rt.create("Acc", "a1")
    rt.create("Driver", "d1", Ref("Acc", "a1"))
    assert rt.call("Driver", "d1", "default_arg") == 10
    assert rt.call("Driver", "d1", "default_arg", 7) == 14


def test_seed_then_call(zoo_ir):
    rt = fresh_runtime(zoo_ir)
    rt.seed("Acc", "a9", {"accid": "a9", "total": 40})
    assert rt.call("Acc", "a9", "add", 2) == 42


def test_event_log_records_roundtrips(zoo_ir):
    """Each remote call is two bus events (CALL out, RETURN back)."""
    rt = fresh_runtime(zoo_ir)
    rt.create("Acc", "a1")
    rt.create("Driver", "d1", Ref("Acc", "a1"))
    before = len(rt.event_log)
    rt.call("Driver", "d1", "seq", 1, 2)
    log = rt.event_log[before:]
    kinds = [e.kind for e in log]
    # client CALL, 2x (CALL + RETURN) for the two remote adds, RESPONSE
    assert kinds.count("CALL") == 3
    assert kinds.count("RETURN") == 2
    assert kinds.count("RESPONSE") == 1


def test_get_state_missing_entity_is_none(zoo_ir):
    rt = fresh_runtime(zoo_ir)
    assert rt.get_state("Acc", "ghost") is None


def test_ref_return_from_create(zoo_ir):
    rt = fresh_runtime(zoo_ir)
    ref = rt.create("Acc", "a1")
    assert ref == Ref("Acc", "a1")


def test_execution_graph_travels_in_events(zoo_ir):
    """Suspended-caller continuations live in events, not operator state
    (paper §2.3: the execution graph is copied into the event)."""
    rt = fresh_runtime(zoo_ir)
    rt.create("Acc", "a1")
    rt.create("Driver", "d1", Ref("Acc", "a1"))
    rt.call("Driver", "d1", "seq", 1, 2)
    with_graph = [e for e in rt.event_log if e.exec_graph_json not in ("", "[]")]
    assert with_graph, "no events carried an execution graph"
    # driver state itself holds only its declared state vars
    st = rt.get_state("Driver", "d1")
    assert set(st) == {"did", "acc", "note"}
