"""Normalization unit tests (remote-op extraction, paper §2.3
"References to remote functions")."""
import ast

import pytest

from repro.core.analysis import CompileError, analyze_class
from repro.core.normalize import (
    REMOTE_CALL,
    REMOTE_CREATE,
    REMOTE_GET,
    normalize_method,
)

from tests.zoo import cls_from_source


def _normalize(src: str, method: str, extra_entities=("Acc",), members=None):
    """Compile helper: src defines class C (+ optionally class Acc)."""
    acc_src = """
    class Acc:
        def __init__(self, accid: str):
            self.accid: str = accid
            self.total: int = 0
        def __key__(self):
            return self.accid
        def add(self, x: int) -> int:
            self.total += x
            return self.total
        def peek(self) -> int:
            return self.total
    """
    Acc = cls_from_source(acc_src, "Acc")
    C = cls_from_source(src, "C")
    names = {"C", *extra_entities}
    desc = analyze_class(C, names)
    return normalize_method(desc, desc.methods[method], names, members)


def _markers(norm):
    out = []
    for stmt in ast.walk(ast.Module(norm.body, [])):
        if (
            isinstance(stmt, ast.Assign)
            and isinstance(stmt.value, ast.Call)
            and isinstance(stmt.value.func, ast.Name)
            and stmt.value.func.id in (REMOTE_CALL, REMOTE_GET, REMOTE_CREATE)
        ):
            out.append(stmt.value.func.id)
    return out


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


class TestExtraction:
    def test_simple_method_untouched(self):
        norm = _normalize(make("return 1 + 2"), "m")
        assert not norm.eligible
        assert norm.n_remote == 0

    def test_single_remote_call(self):
        norm = _normalize(make("x: int = self.acc.add(1)\nreturn x"), "m")
        assert norm.eligible
        assert _markers(norm) == [REMOTE_CALL]

    def test_remote_in_expression_extracted(self):
        norm = _normalize(make("return self.acc.add(1) + self.acc.add(2)"), "m")
        assert _markers(norm) == [REMOTE_CALL, REMOTE_CALL]
        # the return statement itself now only references temps
        ret = norm.body[-1]
        assert isinstance(ret, ast.Return)
        names = {
            n.id for n in ast.walk(ret.value) if isinstance(n, ast.Name)
        }
        assert names == {"__r0", "__r1"}

    def test_remote_attr_read(self):
        norm = _normalize(
            make("t: int = other.total\nreturn t", params=", other: Acc"), "m"
        )
        assert _markers(norm) == [REMOTE_GET]

    def test_remote_create(self):
        norm = _normalize(make("a: Acc = Acc('z')\nreturn 1"), "m")
        assert _markers(norm) == [REMOTE_CREATE]

    def test_nested_remote_args_extract_inner_first(self):
        norm = _normalize(
            make("return self.acc.add(self.acc.peek())"), "m"
        )
        markers = _markers(norm)
        assert markers == [REMOTE_CALL, REMOTE_CALL]
        # first marker is the inner peek, second the outer add
        assigns = [
            s
            for s in norm.body
            if isinstance(s, ast.Assign)
            and isinstance(s.value, ast.Call)
            and isinstance(s.value.func, ast.Name)
        ]
        assert assigns[0].value.args[1].value == "peek"
        assert assigns[1].value.args[1].value == "add"

    def test_augassign_with_remote(self):
        norm = _normalize(
            make("s: int = 0\ns += other.total\nreturn s", params=", other: Acc"),
            "m",
        )
        assert _markers(norm) == [REMOTE_GET]

    def test_self_attr_entity_call(self):
        norm = _normalize(make("return self.acc.peek()"), "m")
        assert _markers(norm) == [REMOTE_CALL]

    def test_while_condition_rewritten(self):
        norm = _normalize(
            make("n: int = 0\nwhile self.acc.add(1) < 3:\n    n += 1\nreturn n"),
            "m",
        )
        loops = [s for s in norm.body if isinstance(s, ast.While)]
        assert len(loops) == 1
        assert isinstance(loops[0].test, ast.Constant)
        assert loops[0].test.value is True
        # body starts with the extraction + a break guard
        assert isinstance(loops[0].body[0], ast.Assign)
        assert isinstance(loops[0].body[1], ast.If)

    def test_loop_var_over_entity_list_is_entity(self):
        norm = _normalize(
            make(
                "s: int = 0\nfor a in accs:\n    s += a.add(1)\nreturn s",
                params=", accs: List[Acc]",
            ),
            "m",
        )
        assert _markers(norm) == [REMOTE_CALL]

    def test_annassign_registers_entity_local(self):
        norm = _normalize(
            make(
                "a: Acc = others[0]\nreturn a.peek()",
                params=", others: list",
            ),
            "m",
        )
        assert _markers(norm) == [REMOTE_CALL]

    def test_eligible_records_remote_classes(self):
        norm = _normalize(make("return self.acc.peek()"), "m")
        assert norm.remote_classes == {"Acc"}


class TestRejections:
    def test_remote_in_boolop_rejected(self):
        with pytest.raises(CompileError, match="short-circuit"):
            _normalize(
                make("return self.acc.peek() > 0 and True"), "m"
            )

    def test_remote_in_ternary_rejected(self):
        with pytest.raises(CompileError, match="short-circuit"):
            _normalize(
                make("return 1 if self.acc.peek() else 2"), "m"
            )

    def test_remote_in_comprehension_rejected(self):
        with pytest.raises(CompileError, match="comprehension"):
            _normalize(
                make(
                    "return [a.peek() for a in accs]",
                    params=", accs: List[Acc]",
                ),
                "m",
            )

    def test_remote_in_lambda_rejected(self):
        with pytest.raises(CompileError, match="lambda|comprehension"):
            _normalize(
                make("f = lambda: self.acc.peek()\nreturn f()"), "m"
            )

    def test_kwargs_in_remote_call_rejected(self):
        with pytest.raises(CompileError, match="keyword"):
            _normalize(make("return self.acc.add(x=1)"), "m")

    def test_store_to_remote_attr_rejected(self):
        with pytest.raises(CompileError, match="assigning to a remote"):
            _normalize(
                make("other.total = 5\nreturn 1", params=", other: Acc"), "m"
            )

    def test_method_on_entity_list_rejected(self):
        with pytest.raises(CompileError, match="List\\[Entity\\]"):
            _normalize(
                make("return accs.pop()", params=", accs: List[Acc]"), "m"
            )

    def test_try_in_eligible_method_rejected(self):
        with pytest.raises(CompileError, match="unsupported statement"):
            _normalize(
                make(
                    "try:\n    x: int = self.acc.add(1)\nexcept Exception:\n"
                    "    x = 0\nreturn x"
                ),
                "m",
            )

    def test_unknown_callee_method_rejected(self):
        members = {"Acc": ({"add", "peek"}, {"accid", "total"})}
        with pytest.raises(CompileError, match="no method 'nope'"):
            _normalize(make("return self.acc.nope()"), "m", members=members)

    def test_unknown_callee_attr_rejected(self):
        members = {"Acc": ({"add", "peek"}, {"accid", "total"})}
        with pytest.raises(CompileError, match="no state variable 'zzz'"):
            _normalize(
                make("return other.zzz", params=", other: Acc"),
                "m",
                members=members,
            )

    def test_try_in_simple_method_allowed(self):
        norm = _normalize(
            make("try:\n    x = 1\nexcept Exception:\n    x = 0\nreturn x"),
            "m",
        )
        assert not norm.eligible


class TestFidelity:
    def test_simple_body_kept_verbatim(self):
        src = make("y = 2\nreturn y * 3")
        norm = _normalize(src, "m")
        assert norm.source() == "y = 2\nreturn y * 3"

    def test_paper_buy_item_normalization(self):
        """§2.3's buy_item, with item.price as a remote read."""
        norm = _normalize(
            make(
                "total_price = amount * item.price\n"
                "is_removed = item.remove_stock(amount)\n"
                "return total_price",
                params=", amount: int, item: Acc",
            ),
            "m",
            members={"Acc": ({"remove_stock"}, {"price"})},
        )
        assert _markers(norm) == [REMOTE_GET, REMOTE_CALL]
        assert "__r0 = __remote_get__(item, 'price')" in norm.source()
        assert (
            "__r1 = __remote__(item, 'remove_stock', amount)" in norm.source()
        )
