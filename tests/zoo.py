"""Shared test entities ("the zoo") + plain-Python oracle execution.

``Acc``/``Driver`` exercise every splitter feature: sequential remote
calls, branches, remote calls in conditions, for/while loops,
break/continue, early returns, remote attribute reads, remote entity
creation, aug-assign with remote reads, state mutation across
suspension, defaults, error propagation, nesting.

Because @stateflow classes stay plain Python, the same classes run
directly ("oracle world") and compiled (any runtime); scenarios compare
return values and final entity states between the two.
"""
from __future__ import annotations

from typing import Any, Dict, List, Tuple

import linecache
import sys
import textwrap
import types
import uuid

from repro.core import serde
from repro.core.entities import Ref, stateflow


def cls_from_source(src: str, name: str) -> type:
    """Build a class from source such that ``inspect.getsource`` works
    (the analyzer needs the source). Registers a synthetic module and a
    linecache entry for the generated filename."""
    src = textwrap.dedent(src)
    mod_name = f"zoo_dyn_{uuid.uuid4().hex[:10]}"
    fname = f"<{mod_name}>"
    linecache.cache[fname] = (
        len(src),
        None,
        src.splitlines(keepends=True),
        fname,
    )
    mod = types.ModuleType(mod_name)
    mod.__file__ = fname
    from typing import Dict, List  # noqa: F401 - available to the source

    mod.List = List
    mod.Dict = Dict
    sys.modules[mod_name] = mod
    code = compile(src, fname, "exec")
    exec(code, mod.__dict__)  # noqa: S102 - tests build classes from source
    return getattr(mod, name)


@stateflow
class Acc:
    """Accumulator — simple (non-split) methods only."""

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

    def fail(self, msg: str) -> int:
        raise ValueError(msg)

    def maybe(self, flag: bool) -> str:
        if flag:
            return "yes"
        return "no"


@stateflow
class Driver:
    """Orchestrator — every method exercises a splitter feature."""

    def __init__(self, did: str, acc: Acc):
        self.did: str = did
        self.acc: Acc = acc
        self.note: str = ""

    def __key__(self):
        return self.did

    def seq(self, a: int, b: int) -> int:
        x: int = self.acc.add(a)
        y: int = self.acc.add(b)
        return x + y

    def branch(self, flag: bool, x: int) -> int:
        if flag:
            r: int = self.acc.add(x)
        else:
            r: int = self.acc.peek()
        return r

    def cond_remote(self, x: int) -> str:
        if self.acc.add(x) > 10:
            return "big"
        return "small"

    def loop_list(self, vals: list) -> int:
        s: int = 0
        for v in vals:
            s += self.acc.add(v)
        return s

    def loop_entities(self, accs: List[Acc], x: int) -> int:
        s: int = 0
        for a in accs:
            s += a.add(x)
        return s

    def while_remote(self, limit: int) -> int:
        n: int = 0
        while self.acc.add(1) < limit:
            n += 1
        return n

    def loop_break(self, vals: list, stop: int) -> int:
        s: int = 0
        for v in vals:
            if v == stop:
                break
            r: int = self.acc.add(v)
            s += r
        return s

    def loop_continue(self, vals: list) -> int:
        s: int = 0
        for v in vals:
            if v % 2 == 0:
                continue
            s += self.acc.add(v)
        return s

    def early_return(self, vals: list, cap: int) -> int:
        for v in vals:
            t: int = self.acc.add(v)
            if t > cap:
                return t
        return -1

    def read_attr(self, other: Acc) -> int:
        return other.total

    def augment(self, other: Acc, x: int) -> int:
        s: int = 100
        s += other.total
        t: int = other.add(x)
        return s + t

    def make_acc(self, name: str, x: int) -> int:
        a: Acc = Acc(name)
        r: int = a.add(x)
        return r

    def call_fail(self, msg: str) -> int:
        r: int = self.acc.fail(msg)
        return r

    def mutate_across(self, x: int) -> str:
        self.note = "before"
        r: int = self.acc.add(x)
        self.note = self.note + "/after"
        return self.note

    def default_arg(self, x: int = 5) -> int:
        return x * 2

    def default_arg_remote(self, x: int = 3) -> int:
        r: int = self.acc.add(x)
        return r

    def nested(self, flag: bool, vals: list) -> int:
        s: int = 0
        if flag:
            for v in vals:
                r: int = self.acc.add(v)
                if r % 2 == 0:
                    s += r
                else:
                    s += 1
        else:
            s = -1
        return s

    def local_loop(self, n: int) -> int:
        base: int = self.acc.peek()
        s: int = 0
        for i in range(n):
            s += i
        return base + s

    def elif_chain(self, x: int) -> str:
        r: int = self.acc.add(x)
        if r < 0:
            label: str = "neg"
        elif r == 0:
            label: str = "zero"
        elif r < 10:
            label: str = "small"
        else:
            label: str = "big"
        return label

    def nested_loops(self, outer: list, inner: list) -> int:
        s: int = 0
        for a in outer:
            for b in inner:
                s += self.acc.add(a * b)
        return s

    def while_in_for(self, vals: list, cap: int) -> int:
        hits: int = 0
        for v in vals:
            while self.acc.peek() < cap:
                r: int = self.acc.add(v)
                hits += 1
        return hits

    def two_entities(self, first: Acc, second: Acc, x: int) -> list:
        a: int = first.add(x)
        b: int = second.add(a)
        c: int = first.peek()
        return [a, b, c]

    def remote_in_call_args(self, x: int) -> int:
        r: int = self.acc.add(self.acc.add(x))
        return r

    def branch_no_else(self, flag: bool, x: int) -> int:
        s: int = 100
        if flag:
            s += self.acc.add(x)
        return s

    def build_string(self, names: list) -> str:
        out: str = ""
        for n in names:
            t: int = self.acc.add(1)
            out = out + n + str(t)
        return out

    def pass_ref_through(self, other: Acc) -> int:
        self.note = "kept"
        r: int = other.maybe(True) == "yes"
        t: int = other.add(2)
        return t


ZOO_CLASSES = [Acc, Driver]

#: (method, args) — args may contain Ref placeholders resolved per world
SCENARIOS: List[Tuple[str, List[Any]]] = [
    ("seq", [3, 4]),
    ("seq", [0, 0]),
    ("branch", [True, 5]),
    ("branch", [False, 5]),
    ("cond_remote", [20]),
    ("cond_remote", [1]),
    ("loop_list", [[1, 2, 3, 4]]),
    ("loop_list", [[]]),
    ("loop_entities", [[Ref("Acc", "a1"), Ref("Acc", "a2"), Ref("Acc", "a3")], 2]),
    ("loop_entities", [[], 2]),
    ("while_remote", [5]),
    ("while_remote", [1]),
    ("loop_break", [[1, 2, 9, 3], 9]),
    ("loop_break", [[1, 2, 3], 99]),
    ("loop_continue", [[1, 2, 3, 4, 5]]),
    ("early_return", [[5, 5, 5], 8]),
    ("early_return", [[1, 1], 99]),
    ("read_attr", [Ref("Acc", "a2")]),
    ("augment", [Ref("Acc", "a2"), 7]),
    ("make_acc", ["zz", 4]),
    ("mutate_across", [9]),
    ("default_arg", []),
    ("default_arg", [11]),
    ("default_arg_remote", []),
    ("default_arg_remote", [10]),
    ("nested", [True, [1, 2, 3]]),
    ("nested", [False, [1, 2, 3]]),
    ("local_loop", [6]),
    ("elif_chain", [-5]),
    ("elif_chain", [0]),
    ("elif_chain", [3]),
    ("elif_chain", [50]),
    ("nested_loops", [[1, 2], [3, 4]]),
    ("nested_loops", [[], [3]]),
    ("while_in_for", [[2, 3], 7]),
    ("two_entities", [Ref("Acc", "a2"), Ref("Acc", "a3"), 5]),
    ("remote_in_call_args", [4]),
    ("branch_no_else", [True, 2]),
    ("branch_no_else", [False, 2]),
    ("build_string", [["x", "y", "z"]]),
    ("pass_ref_through", [Ref("Acc", "a2")]),
]

SCENARIO_IDS = [f"{m}-{i}" for i, (m, _) in enumerate(SCENARIOS)]

WORLD_ACCS = ["a1", "a2", "a3"]


def canon(value: Any) -> Any:
    """Canonical form for cross-world comparison: serde roundtrip
    (tuples→lists, Refs normalized)."""
    return serde.loads(serde.dumps(_objs_to_refs(value)))


def _objs_to_refs(value: Any) -> Any:
    if isinstance(value, (Acc, Driver)):
        return Ref(type(value).__name__, value.__key__())
    if isinstance(value, dict):
        return {k: _objs_to_refs(v) for k, v in value.items()}
    if isinstance(value, (list, tuple)):
        return [_objs_to_refs(v) for v in value]
    return value


def run_oracle(method: str, args: List[Any]) -> Dict[str, Any]:
    """Execute a scenario directly on the plain Python classes."""
    objs: Dict[Tuple[str, str], Any] = {}
    for a in WORLD_ACCS:
        objs[("Acc", a)] = Acc(a)
    objs[("Driver", "d1")] = Driver("d1", objs[("Acc", "a1")])

    # patch entity creation so oracle-created instances are tracked
    def resolve(v: Any) -> Any:
        if isinstance(v, Ref):
            return objs[(v.class_name, v.key)]
        if isinstance(v, list):
            return [resolve(x) for x in v]
        return v

    created: List[Acc] = []
    import tests.zoo as zoo_mod  # Acc("zz") inside Driver resolves here

    orig_init = Acc.__init__

    def tracking_init(self, accid: str):
        orig_init(self, accid)
        created.append(self)

    Acc.__init__ = tracking_init
    try:
        d1 = objs[("Driver", "d1")]
        error = None
        result = None
        try:
            result = getattr(d1, method)(*[resolve(a) for a in args])
        except Exception as e:  # noqa: BLE001 - compared with runtime error
            error = f"{type(e).__name__}: {e}"
    finally:
        Acc.__init__ = orig_init
    for obj in created:
        objs[("Acc", obj.accid)] = obj
    states = {
        f"{cls}/{key}": canon(dict(o.__dict__)) for (cls, key), o in objs.items()
    }
    return {"result": canon(result), "error": error, "states": states}


def run_runtime(
    runtime, method: str, args: List[Any], ns: str = ""
) -> Dict[str, Any]:
    """Execute the same scenario on a deployed StateFlow runtime.

    The runtime must already have the zoo IR deployed; this creates the
    world entities, runs the scenario and reads back all states. ``ns``
    prefixes every entity key so expensive runtimes (streaming) can run
    many scenarios on one deployment without key collisions; reported
    states use the un-prefixed names so they compare against the oracle.
    """
    from repro.runtimes.base import EntityError

    def remap(v: Any) -> Any:
        if isinstance(v, Ref):
            return Ref(v.class_name, ns + v.key)
        if isinstance(v, list):
            return [remap(x) for x in v]
        return v

    args = [remap(a) for a in args]
    if method == "make_acc":
        args = [ns + args[0]] + args[1:]
    rids = [
        runtime.submit_call("Acc", ns + a, "__init__", [ns + a])
        for a in WORLD_ACCS
    ]
    rids.append(
        runtime.submit_call(
            "Driver", ns + "d1", "__init__", [ns + "d1", Ref("Acc", ns + "a1")]
        )
    )
    for rid in rids:
        runtime.result(rid, timeout=120)
    error = None
    result = None
    try:
        result = runtime.call("Driver", ns + "d1", method, *args)
    except EntityError as e:
        error = str(e)
    keys = [("Acc", a) for a in WORLD_ACCS] + [("Driver", "d1")]
    if method == "make_acc" and error is None:
        keys.append(("Acc", args[0][len(ns):]))
    states = {
        f"{cls}/{key}": _strip_ns(
            canon(runtime.get_state(cls, ns + key)), ns
        )
        for cls, key in keys
    }
    return {
        "result": _strip_ns(canon(result), ns),
        "error": error,
        "states": states,
    }


def _strip_ns(value: Any, ns: str) -> Any:
    """Undo the key namespacing in values for oracle comparison."""
    if not ns:
        return value
    if isinstance(value, Ref):
        key = value.key
        if isinstance(key, str) and key.startswith(ns):
            key = key[len(ns):]
        return Ref(value.class_name, key)
    if isinstance(value, dict):
        return {k: _strip_ns(v, ns) for k, v in value.items()}
    if isinstance(value, list):
        return [_strip_ns(v, ns) for v in value]
    if isinstance(value, str) and value.startswith(ns):
        return value[len(ns):]
    return value


def assert_same_world(oracle: Dict[str, Any], measured: Dict[str, Any]) -> None:
    assert (oracle["error"] is None) == (measured["error"] is None), (
        f"error mismatch: oracle={oracle['error']} runtime={measured['error']}"
    )
    if oracle["error"] is None:
        assert oracle["result"] == measured["result"], (
            f"result mismatch: {oracle['result']!r} != {measured['result']!r}"
        )
    for k, st in measured["states"].items():
        if k in oracle["states"]:
            assert oracle["states"][k] == st, (
                f"state mismatch for {k}: {oracle['states'][k]!r} != {st!r}"
            )
