"""IR construction + worker interpreter tests (paper §2.2/§2.3 and the
Table 1 translation), exercising the event protocol directly without a
runtime."""
import json

import pytest

from repro.core.analysis import CompileError
from repro.core.entities import Ref
from repro.core.events import CALL, RESPONSE, RETURN, Event
from repro.core.ir import EGRESS, INGRESS, DataflowIR, build_ir
from repro.core.routing import is_client_bound, partition_key, split_outputs
from repro.core.worker import CompiledIR, handle
from repro.deathstar.entities import ALL_ENTITIES

from tests.zoo import ZOO_CLASSES, cls_from_source


@pytest.fixture(scope="module")
def zoo_ir():
    return build_ir(ZOO_CLASSES)


@pytest.fixture(scope="module")
def compiled(zoo_ir):
    return CompiledIR.from_ir(zoo_ir)


class TestIR:
    def test_operator_per_class(self, zoo_ir):
        assert set(zoo_ir.operators) == {"Acc", "Driver"}

    def test_edges_from_remote_refs(self, zoo_ir):
        assert ("Driver", "Acc") in zoo_ir.edges

    def test_dataflow_nodes_include_routers(self, zoo_ir):
        nodes = zoo_ir.dataflow_nodes()
        assert nodes[0] == INGRESS and nodes[-1] == EGRESS

    def test_ingress_fans_out_egress_fans_in(self, zoo_ir):
        e = zoo_ir.dataflow_edges()
        for op in zoo_ir.operators:
            assert (INGRESS, op) in e
            assert (op, EGRESS) in e

    def test_json_roundtrip(self, zoo_ir):
        back = DataflowIR.from_json(zoo_ir.to_json())
        assert set(back.operators) == set(zoo_ir.operators)
        assert back.edges == zoo_ir.edges
        assert back.to_json() == zoo_ir.to_json()

    def test_compiled_from_json_cached(self, zoo_ir):
        a = CompiledIR.from_json(zoo_ir.to_json())
        b = CompiledIR.from_json(zoo_ir.to_json())
        assert a is b

    def test_key_param_index(self, zoo_ir):
        assert zoo_ir.operators["Acc"].key_param_index == 0
        assert zoo_ir.operators["Driver"].key_param_index == 0

    def test_deathstar_ir_edges(self):
        ir = build_ir(ALL_ENTITIES)
        assert ("Search", "Geo") in ir.edges
        assert ("Search", "Hotel") in ir.edges
        assert ("Reservation", "User") in ir.edges
        assert ("User", "Hotel") not in ir.edges

    def test_self_call_to_split_method_rejected(self):
        src = """
class C:
    def __init__(self, cid: str, acc: Acc):
        self.cid: str = cid
        self.acc: Acc = acc
    def __key__(self):
        return self.cid
    def split_one(self, x: int) -> int:
        r: int = self.acc.add(x)
        return r
    def caller(self) -> int:
        return self.split_one(1)
"""
        C = cls_from_source(src, "C")
        with pytest.raises(CompileError, match="self-call to split method"):
            build_ir([ZOO_CLASSES[0], C])

    def test_simple_methods_listed(self, zoo_ir):
        op = zoo_ir.operators["Acc"]
        assert set(op.simple_methods()) >= {"add", "peek", "fail"}
        dop = zoo_ir.operators["Driver"]
        assert "seq" in dop.split_methods()
        assert "default_arg" in dop.simple_methods()


class TestTable1Translation:
    """Paper Table 1: the OO → dataflow construct mapping."""

    def test_class_becomes_operator(self, zoo_ir):
        for cls in ZOO_CLASSES:
            assert cls.__name__ in zoo_ir.operators

    def test_object_state_becomes_operator_state(self, zoo_ir):
        assert set(zoo_ir.operators["Acc"].state_vars) == {"accid", "total"}
        assert set(zoo_ir.operators["Driver"].state_vars) == {
            "did",
            "acc",
            "note",
        }

    def test_call_args_travel_in_event_header(self, compiled):
        ev = Event.call("Acc", "a1", "__init__", ["a1"], request_id="r")
        assert ev.args == ["a1"]  # header: args_json
        res = handle(compiled, ev, None)
        # return value travels in the payload of the outgoing event
        assert res.events[0].kind == RESPONSE
        assert res.events[0].payload["value"] == Ref("Acc", "a1")

    def test_return_value_in_event_payload(self, compiled):
        st = handle(
            compiled,
            Event.call("Acc", "a1", "__init__", ["a1"], request_id="r"),
            None,
        ).new_state_json
        res = handle(
            compiled, Event.call("Acc", "a1", "add", [7], request_id="r2"), st
        )
        assert res.events[0].payload == {"ok": True, "value": 7}


class TestWorkerProtocol:
    def _init(self, compiled, cls, key, args):
        res = handle(
            compiled, Event.call(cls, key, "__init__", args, request_id="r0"), None
        )
        return res.new_state_json

    def test_split_call_emits_remote_call_event(self, compiled):
        acc_state = self._init(compiled, "Acc", "a1", ["a1"])
        drv_state = self._init(
            compiled, "Driver", "d1", ["d1", Ref("Acc", "a1")]
        )
        res = handle(
            compiled,
            Event.call("Driver", "d1", "seq", [1, 2], request_id="r1"),
            drv_state,
        )
        assert len(res.events) == 1
        out = res.events[0]
        assert out.kind == CALL
        assert (out.class_name, out.key) == ("Acc", "a1")
        assert out.method == "add" and out.args == [1]
        assert out.exec_graph_json  # carries the suspended caller frame

    def test_return_resumes_caller(self, compiled):
        acc_state = self._init(compiled, "Acc", "a1", ["a1"])
        drv_state = self._init(
            compiled, "Driver", "d1", ["d1", Ref("Acc", "a1")]
        )
        r1 = handle(
            compiled,
            Event.call("Driver", "d1", "seq", [1, 2], request_id="r1"),
            drv_state,
        )
        call1 = r1.events[0]
        r2 = handle(compiled, call1, acc_state)
        ret1 = r2.events[0]
        assert ret1.kind == RETURN
        assert (ret1.class_name, ret1.key) == ("Driver", "d1")
        assert ret1.payload == 1
        # resume the driver: it should fire the second add
        r3 = handle(compiled, ret1, r1.new_state_json)
        call2 = r3.events[0]
        assert call2.kind == CALL and call2.args == [2]
        # run it and the final resume completes with a RESPONSE
        r4 = handle(compiled, call2, r2.new_state_json)
        r5 = handle(compiled, r4.events[0], r3.new_state_json)
        assert r5.events[0].kind == RESPONSE
        assert r5.events[0].payload == {"ok": True, "value": 1 + 3}

    def test_get_method(self, compiled):
        acc_state = self._init(compiled, "Acc", "a1", ["a1"])
        res = handle(
            compiled,
            Event.call("Acc", "a1", "__get__", ["total"], request_id="r"),
            acc_state,
        )
        assert res.events[0].payload == {"ok": True, "value": 0}

    def test_get_unknown_attr_errors(self, compiled):
        acc_state = self._init(compiled, "Acc", "a1", ["a1"])
        res = handle(
            compiled,
            Event.call("Acc", "a1", "__get__", ["zzz"], request_id="r"),
            acc_state,
        )
        assert res.events[0].payload["ok"] is False

    def test_state_method(self, compiled):
        acc_state = self._init(compiled, "Acc", "a1", ["a1"])
        res = handle(
            compiled,
            Event.call("Acc", "a1", "__state__", [], request_id="r"),
            acc_state,
        )
        assert res.events[0].payload["value"] == {"accid": "a1", "total": 0}

    def test_seed_event(self, compiled):
        from repro.core import serde

        ev = Event(
            kind="SEED",
            class_name="Acc",
            key="a1",
            payload_json=serde.dumps({"accid": "a1", "total": 9}),
            request_id="r",
        )
        res = handle(compiled, ev, None)
        assert json.loads(res.new_state_json)["total"] == 9
        assert res.events[0].kind == RESPONSE

    def test_error_becomes_error_response(self, compiled):
        res = handle(
            compiled,
            Event.call("Acc", "ghost", "add", [1], request_id="r"),
            None,
        )
        assert res.events[0].payload["ok"] is False
        assert "no entity" in res.events[0].payload["error"]
        assert res.new_state_json is None

    def test_unknown_class_errors(self, compiled):
        res = handle(
            compiled,
            Event.call("Nope", "x", "m", [], request_id="r"),
            None,
        )
        assert res.events[0].payload["ok"] is False

    def test_timings_populated(self, compiled):
        acc_state = self._init(compiled, "Acc", "a1", ["a1"])
        t = {}
        handle(
            compiled,
            Event.call("Acc", "a1", "add", [1], request_id="r"),
            acc_state,
            timings=t,
        )
        assert {"state_deser", "construct", "execute", "state_ser", "route"} <= set(t)
        assert all(v >= 0 for v in t.values())

    def test_request_id_propagates(self, compiled):
        acc_state = self._init(compiled, "Acc", "a1", ["a1"])
        drv_state = self._init(
            compiled, "Driver", "d1", ["d1", Ref("Acc", "a1")]
        )
        res = handle(
            compiled,
            Event.call("Driver", "d1", "seq", [1, 2], request_id="req-42"),
            drv_state,
        )
        assert res.events[0].request_id == "req-42"


class TestRouting:
    def test_partition_key(self):
        e = Event.call("Acc", 7, "add", [], request_id="r")
        assert partition_key(e) == ("Acc", "7")

    def test_egress_split(self):
        evs = [
            Event.call("A", "k", "m", [], request_id="r"),
            Event.response("r", value=1),
            Event.ret("A", "k", 1, request_id="r", exec_graph_json="[]"),
        ]
        loop, out = split_outputs(evs)
        assert len(loop) == 2 and len(out) == 1
        assert is_client_bound(out[0])
