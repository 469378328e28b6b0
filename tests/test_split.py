"""Function-splitting unit tests (paper §2.3, Fig. 2): block structure,
the paper's used/defined variable-passing convention, control-flow
wiring, and the generated sources."""
import ast

import pytest

from repro.core.analysis import analyze_class
from repro.core.normalize import normalize_method
from repro.core.split import _scan_used_defined, split_method
from repro.core.statemachine import (
    EXIT,
    BlockNode,
    CondNode,
    ForNode,
    RemoteCallNode,
)

from tests.zoo import cls_from_source


def _machine(src: str, method: str = "m"):
    C = cls_from_source(src, "C")
    names = {"C", "Acc"}
    desc = analyze_class(C, names)
    minfo = desc.methods[method]
    norm = normalize_method(desc, minfo, names)
    return split_method(desc, minfo, norm)


BASE = """
class C:
    def __init__(self, cid: str, acc: Acc):
        self.cid: str = cid
        self.acc: Acc = acc
    def __key__(self):
        return self.cid
    def m(self{params}):
{body}
"""


def make(body: str, params: str = "") -> str:
    body = "\n".join(
        "        " + line for line in body.strip("\n").splitlines()
    )
    return BASE.format(params=params, body=body)


class TestScanUsedDefined:
    def _scan(self, src: str, local_names):
        stmts = ast.parse(src).body
        return _scan_used_defined(stmts, set(local_names))

    def test_simple_def(self):
        used, defined = self._scan("x = 1", ["x"])
        assert used == [] and defined == ["x"]

    def test_use_before_def(self):
        used, defined = self._scan("y = x + 1", ["x", "y"])
        assert used == ["x"] and defined == ["y"]

    def test_self_assign_is_use_and_def(self):
        used, defined = self._scan("x = x + 1", ["x"])
        assert used == ["x"] and defined == ["x"]

    def test_augassign_is_use_and_def(self):
        used, defined = self._scan("x += 1", ["x"])
        assert used == ["x"] and defined == ["x"]

    def test_def_shadows_later_use(self):
        used, defined = self._scan("x = 1\ny = x", ["x", "y"])
        assert used == [] and defined == ["x", "y"]

    def test_subscript_store_is_use(self):
        used, defined = self._scan("d[0] = 1", ["d"])
        assert used == ["d"] and defined == []

    def test_globals_not_params(self):
        used, defined = self._scan("y = len(x)", ["x", "y"])
        assert used == ["x"] and defined == ["y"]

    def test_method_call_is_use(self):
        used, defined = self._scan("acc.append(v)", ["acc", "v"])
        assert used == ["acc", "v"] and defined == []

    def test_order_preserved(self):
        used, _ = self._scan("z = a + b + c", ["a", "b", "c", "z"])
        assert used == ["a", "b", "c"]


class TestPaperExample:
    """The buy_item split of §2.3 — variable-passing convention."""

    SRC = make(
        "total_price = amount * item.price\n"
        "is_removed = item.remove_stock(amount)\n"
        "return total_price",
        params=", amount: int, item: Acc",
    )

    def test_node_chain(self):
        sm = _machine(self.SRC)
        kinds = [sm.nodes[i].kind for i in sorted(sm.nodes)]
        assert kinds == ["block", "remote", "block", "remote", "block"]

    def test_remote_nodes(self):
        sm = _machine(self.SRC)
        remotes = sm.remote_nodes()
        assert [(r.call_kind, r.method) for r in remotes] == [
            ("get", "price"),
            ("call", "remove_stock"),
        ]

    def test_defined_then_used_convention(self):
        """Paper: "since buy_item_0 defines total_price, its value is
        returned from the function. Next, since buy_item_1 uses
        total_price, it is defined as parameter." In our generalization
        (item.price is also remote) the definer is the middle block and
        the user the final block."""
        sm = _machine(self.SRC)
        blocks = sorted(sm.blocks(), key=lambda b: b.id)
        definer = next(b for b in blocks if "total_price" in b.defines)
        user = next(b for b in blocks if b.id > definer.id)
        assert "total_price" in user.params

    def test_block_names_paper_style(self):
        sm = _machine(self.SRC)
        assert [b.name for b in sorted(sm.blocks(), key=lambda b: b.id)] == [
            "m_0",
            "m_1",
            "m_2",
        ]

    def test_generated_sources_compile(self):
        sm = _machine(self.SRC)
        for b in sm.blocks():
            compile(b.source, "<gen>", "exec")

    def test_blocks_return_defined_vars(self):
        sm = _machine(self.SRC)
        for b in sm.blocks():
            assert f"def {b.name}(" in b.source
            assert "return {" in b.source


class TestControlFlow:
    def test_if_becomes_cond_node(self):
        sm = _machine(
            make(
                "if flag:\n    r: int = self.acc.add(1)\nelse:\n"
                "    r: int = self.acc.peek()\nreturn r",
                params=", flag: bool",
            )
        )
        conds = [n for n in sm.nodes.values() if isinstance(n, CondNode)]
        assert len(conds) == 1
        assert conds[0].test_src == "flag"
        assert conds[0].true_next != conds[0].false_next

    def test_for_becomes_for_node(self):
        sm = _machine(
            make(
                "s: int = 0\nfor v in vals:\n    s += self.acc.add(v)\n"
                "return s",
                params=", vals: list",
            )
        )
        fors = [n for n in sm.nodes.values() if isinstance(n, ForNode)]
        assert len(fors) == 1
        f = fors[0]
        assert f.loop_var == "v"
        assert f.body_next != f.after_next

    def test_for_body_loops_back(self):
        sm = _machine(
            make(
                "s: int = 0\nfor v in vals:\n    s += self.acc.add(v)\n"
                "return s",
                params=", vals: list",
            )
        )
        f = next(n for n in sm.nodes.values() if isinstance(n, ForNode))
        # follow the body chain; it must return to the ForNode
        seen = set()
        nid = f.body_next
        while nid != f.id:
            assert nid not in seen and nid != EXIT
            seen.add(nid)
            node = sm.nodes[nid]
            nid = node.next if hasattr(node, "next") else node.after_next
        assert nid == f.id

    def test_while_cond_loops(self):
        sm = _machine(
            make(
                "n: int = 0\nwhile n < 3:\n    r: int = self.acc.add(1)\n"
                "    n += 1\nreturn n"
            )
        )
        conds = [n for n in sm.nodes.values() if isinstance(n, CondNode)]
        assert len(conds) == 1

    def test_return_exits(self):
        sm = _machine(make("x: int = self.acc.add(1)\nreturn x"))
        last = sm.nodes[max(sm.nodes)]
        assert isinstance(last, BlockNode)
        assert last.next == EXIT
        assert "__ret" in last.defines

    def test_implicit_return_none(self):
        sm = _machine(make("x: int = self.acc.add(1)"))
        tail = sm.nodes[max(sm.nodes)]
        assert tail.next == EXIT
        assert "__ret" not in tail.defines  # falls off the end -> None

    def test_break_jumps_to_loop_after(self):
        sm = _machine(
            make(
                "s: int = 0\nfor v in vals:\n    if v == 0:\n        break\n"
                "    s += self.acc.add(v)\nreturn s",
                params=", vals: list",
            )
        )
        f = next(n for n in sm.nodes.values() if isinstance(n, ForNode))
        cond = next(n for n in sm.nodes.values() if isinstance(n, CondNode))
        # break path: cond.true -> pass block -> loop after target
        br = sm.nodes[cond.true_next]
        assert isinstance(br, BlockNode)
        assert br.next == f.after_next

    def test_continue_jumps_to_loop_head(self):
        sm = _machine(
            make(
                "s: int = 0\nfor v in vals:\n    if v == 0:\n        continue\n"
                "    s += self.acc.add(v)\nreturn s",
                params=", vals: list",
            )
        )
        f = next(n for n in sm.nodes.values() if isinstance(n, ForNode))
        cond = next(n for n in sm.nodes.values() if isinstance(n, CondNode))
        br = sm.nodes[cond.true_next]
        assert br.next == f.id

    def test_simple_method_single_source(self):
        sm = _machine(make("return 40 + 2"))
        assert not sm.eligible
        assert sm.nodes == {}
        assert "def m(self):" in sm.simple_source
        assert "return 40 + 2" in sm.simple_source

    def test_simple_method_annotations_stripped(self):
        sm = _machine(
            make("return x", params=", x: int"),
        )
        assert not sm.eligible
        assert ": int" not in sm.simple_source.splitlines()[0]

    def test_defaults_captured(self):
        sm = _machine(make("return x", params=", x: int = 9"))
        assert sm.param_defaults == {"x": 9}

    def test_remote_hidden_locals_in_block(self):
        sm = _machine(make("r: int = self.acc.add(5)\nreturn r"))
        b0 = sm.nodes[min(sm.nodes)]
        assert "__call_0_target" in b0.defines
        assert "__call_0_args" in b0.defines
        rn = next(
            n for n in sm.nodes.values() if isinstance(n, RemoteCallNode)
        )
        assert rn.result_var == "__r0"
        assert rn.call_id == 0

    def test_entry_points_to_first_block(self):
        sm = _machine(make("r: int = self.acc.add(5)\nreturn r"))
        assert sm.entry == min(sm.nodes)

    def test_dead_code_after_return_dropped(self):
        sm = _machine(
            make("return self.acc.add(1)\nx = 1\ny = 2")
        )
        for b in sm.blocks():
            assert "x = 1" not in b.source


class TestInitSplitting:
    def test_init_with_remote_call(self):
        src = """
class C:
    def __init__(self, cid: str, acc: Acc):
        self.cid: str = cid
        self.acc: Acc = acc
        self.start: int = 0
        self.start = acc.peek()
    def __key__(self):
        return self.cid
"""
        sm = _machine(src, method="__init__")
        assert sm.eligible
        assert [r.method for r in sm.remote_nodes()] == ["peek"]
        # paper-style name strips dunder underscores
        assert sm.blocks()[0].name.startswith("init_")
