"""Serde, event-model, execution-graph and state-machine serialization
tests (paper Table 1: events carry call args in the header and return
values in the payload; everything must survive JSON hops)."""
import json

import pytest

from repro.core import serde
from repro.core.entities import Ref, ref_of, stateflow
from repro.core.events import (
    CALL,
    EVENT_SCHEMA,
    FIELDS,
    RESPONSE,
    RETURN,
    Event,
)
from repro.core.exec_graph import ExecutionGraph, Frame
from repro.core.ir import build_ir
from repro.core.statemachine import StateMachine

from tests.zoo import ZOO_CLASSES


class TestSerde:
    @pytest.mark.parametrize(
        "value",
        [
            None,
            0,
            1.5,
            "x",
            True,
            [1, 2, 3],
            {"a": 1, "b": [None, "y"]},
            {"nested": {"deep": [{"k": 1}]}},
        ],
        ids=repr,
    )
    def test_roundtrip_identity(self, value):
        assert serde.loads(serde.dumps(value)) == value

    def test_tuple_becomes_list(self):
        assert serde.loads(serde.dumps((1, 2))) == [1, 2]

    def test_ref_roundtrip(self):
        r = Ref("Item", "apple")
        assert serde.loads(serde.dumps(r)) == r

    def test_ref_nested_in_containers(self):
        v = {"refs": [Ref("A", "1"), {"inner": Ref("B", 2)}]}
        got = serde.loads(serde.dumps(v))
        assert got["refs"][0] == Ref("A", "1")
        assert got["refs"][1]["inner"] == Ref("B", 2)

    def test_ref_encoding_shape(self):
        raw = json.loads(serde.dumps(Ref("A", "k")))
        assert raw == {"__ref__": ["A", "k"]}

    def test_plain_dict_with_ref_key_not_confused(self):
        v = {"__ref__": ["A", "k"], "extra": 1}
        got = serde.loads(serde.dumps(v))
        assert isinstance(got, dict) and got["extra"] == 1

    def test_ref_of_live_object(self):
        @stateflow
        class Tmp:
            def __init__(self, tid: str):
                self.tid: str = tid

            def __key__(self):
                return self.tid

        assert ref_of(Tmp("t1")) == Ref("Tmp", "t1")

    def test_ref_of_non_entity_rejected(self):
        with pytest.raises(TypeError):
            ref_of(object())


class TestEvents:
    def test_call_constructor(self):
        e = Event.call("Acc", "a1", "add", [5], request_id="r1")
        assert e.kind == CALL
        assert e.class_name == "Acc" and e.key == "a1"
        assert e.args == [5]
        assert e.request_id == "r1"

    def test_key_stringified(self):
        e = Event.call("Acc", 42, "add", [], request_id="r")
        assert e.key == "42"

    def test_return_constructor(self):
        e = Event.ret("Acc", "a1", {"v": 1}, request_id="r", exec_graph_json="[]")
        assert e.kind == RETURN
        assert e.payload == {"v": 1}

    def test_response_ok(self):
        e = Event.response("r", value=[1, 2])
        assert e.kind == RESPONSE
        assert e.payload == {"ok": True, "value": [1, 2]}

    def test_response_error(self):
        e = Event.response("r", error="boom")
        assert e.payload == {"ok": False, "error": "boom"}

    def test_row_roundtrip(self):
        e = Event.call("Acc", "a1", "add", [5, Ref("B", "b")], request_id="r")
        row = dict(zip(FIELDS, e.to_row()))
        back = Event(**row)
        assert back.args == [5, Ref("B", "b")]
        assert back.event_id == e.event_id

    def test_json_line_roundtrip(self):
        e = Event.call("Acc", "a1", "add", [5], request_id="r")
        back = Event.from_json_line(e.to_json_line())
        assert back.to_row() == e.to_row()

    def test_schema_matches_fields(self):
        assert [f.name for f in EVENT_SCHEMA.fields] == FIELDS
        assert len(set(FIELDS)) == len(FIELDS)

    def test_event_ids_unique(self):
        ids = {Event.response("r").event_id for _ in range(100)}
        assert len(ids) == 100


class TestExecutionGraph:
    def _graph(self):
        g = ExecutionGraph()
        g.push(Frame("User", "u1", "buy", 3, {"x": 1, "ref": Ref("Item", "i")}))
        g.push(Frame("Item", "i", "remove_stock", 1, {"amount": 2}))
        return g

    def test_roundtrip(self):
        g = self._graph()
        back = ExecutionGraph.from_json(g.to_json())
        assert back.depth == 2
        assert back.top.class_name == "Item"
        assert back.frames[0].locals["ref"] == Ref("Item", "i")

    def test_empty_graph(self):
        assert ExecutionGraph.from_json("").depth == 0
        g = ExecutionGraph()
        assert ExecutionGraph.from_json(g.to_json()).depth == 0

    def test_push_pop(self):
        g = self._graph()
        f = g.pop()
        assert f.method == "remove_stock"
        assert g.top.class_name == "User"

    def test_intermediate_results_live_in_locals(self):
        """Paper: the execution graph stores the intermediate results."""
        g = self._graph()
        g.top.locals["total_price"] = 30
        back = ExecutionGraph.from_json(g.to_json())
        assert back.top.locals["total_price"] == 30


class TestStateMachineSerde:
    def test_all_zoo_machines_roundtrip(self):
        ir = build_ir(ZOO_CLASSES)
        for op in ir.operators.values():
            for sm in op.machines.values():
                back = StateMachine.from_json(
                    json.loads(json.dumps(sm.to_json()))
                )
                assert back.entry == sm.entry
                assert back.eligible == sm.eligible
                assert set(back.nodes) == set(sm.nodes)
                for nid in sm.nodes:
                    assert back.nodes[nid].__dict__ == sm.nodes[nid].__dict__

    def test_unknown_node_kind_rejected(self):
        with pytest.raises(ValueError, match="unknown node kind"):
            StateMachine.from_json(
                {
                    "class_name": "C",
                    "method": "m",
                    "entry": 1,
                    "eligible": True,
                    "nodes": {"1": {"kind": "alien"}},
                }
            )
