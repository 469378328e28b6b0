"""Remote-operation extraction (three-address normalization).

The paper's splitter must suspend a function *at the spot a remote call
happens* (§2.3). To make that uniform, this pass rewrites every remote
operation nested inside an expression into its own marker statement::

    total_price += item.price
        ==>
    __r0 = __remote_get__(item, 'price')
    total_price += __r0

    if item.enough_stock(n): ...
        ==>
    __r1 = __remote__(item, 'enough_stock', n)
    if __r1: ...

Recognized remote operations (driven by type annotations, paper §2.3
"References to remote functions"):

* ``e.m(args)``   — remote method call, ``e`` entity-typed
* ``e.a``         — remote attribute read (Listing 1's ``item.price``)
* ``E(args)``     — remote entity creation, ``E`` an entity class

``e`` may be a parameter/local annotated with an entity type, a loop
variable over a ``List[Entity]``, or ``self.<var>`` where the state var
is entity-typed. Assigning to a remote attribute is rejected (mutate
remote entities through their methods). Remote ops inside short-circuit
or deferred contexts (``and``/``or``/ternary/lambda/comprehension) are
rejected because extraction would change evaluation semantics.

A ``while`` whose condition contains remote ops is rewritten into
``while True: <extract>; if not cond': break; body`` so the condition's
remote calls re-execute every iteration.

Methods in which this pass finds **no** remote operation keep their
original body and are marked non-eligible (they run as a single block,
never split — paper §2.3 "these functions are eligible").
"""
from __future__ import annotations

import ast
from dataclasses import dataclass, field
from typing import Dict, List, Optional, Set, Tuple

from repro.core.analysis import (
    ClassDescriptor,
    CompileError,
    MethodInfo,
    parse_type,
)

REMOTE_CALL = "__remote__"
REMOTE_GET = "__remote_get__"
REMOTE_CREATE = "__remote_create__"
REMOTE_MARKERS = (REMOTE_CALL, REMOTE_GET, REMOTE_CREATE)


@dataclass
class NormalizedMethod:
    """Result of normalization for one method."""

    body: List[ast.stmt]
    n_remote: int
    eligible: bool  # True iff at least one remote op was found
    #: entity classes this method calls into (dataflow-graph edges)
    remote_classes: Set[str] = field(default_factory=set)

    def source(self) -> str:
        return "\n".join(ast.unparse(s) for s in self.body)


@dataclass
class _Env:
    """Flow-sensitive typing environment for one method body."""

    entities: Dict[str, str] = field(default_factory=dict)  # name -> class
    entity_lists: Dict[str, str] = field(default_factory=dict)

    def copy(self) -> "_Env":
        return _Env(dict(self.entities), dict(self.entity_lists))


def _is_self(node: ast.expr) -> bool:
    return isinstance(node, ast.Name) and node.id == "self"


class _Normalizer:
    def __init__(
        self,
        desc: ClassDescriptor,
        method: MethodInfo,
        entity_names: Set[str],
        members: Optional[Dict[str, Tuple[Set[str], Set[str]]]] = None,
    ):
        self.desc = desc
        self.method = method
        self.entity_names = entity_names
        #: class -> (method names, state var names), for static checking
        self.members = members or {}
        self.counter = 0
        self.n_remote = 0
        self.remote_classes: Set[str] = set()
        self.env = _Env(
            dict(method.entity_env), dict(method.entity_list_env)
        )

    # -- typing helpers -------------------------------------------------

    def _entity_class_of(self, node: ast.expr) -> Optional[str]:
        """Entity class of ``node`` if it denotes a single entity ref."""
        if isinstance(node, ast.Name) and node.id in self.env.entities:
            return self.env.entities[node.id]
        if (
            isinstance(node, ast.Attribute)
            and _is_self(node.value)
            and node.attr in self.desc.entity_state_vars()
        ):
            return self.desc.entity_state_vars()[node.attr]
        return None

    def _entity_list_class_of(self, node: ast.expr) -> Optional[str]:
        if isinstance(node, ast.Name) and node.id in self.env.entity_lists:
            return self.env.entity_lists[node.id]
        if (
            isinstance(node, ast.Attribute)
            and _is_self(node.value)
            and node.attr in self.desc.entity_list_state_vars()
        ):
            return self.desc.entity_list_state_vars()[node.attr]
        return None

    def _fresh(self) -> str:
        name = f"__r{self.counter}"
        self.counter += 1
        return name

    def _err(self, node: ast.AST, msg: str) -> CompileError:
        return CompileError(
            f"{self.desc.name}.{self.method.name} (line "
            f"{getattr(node, 'lineno', '?')}): {msg}"
        )

    # -- expression extraction ------------------------------------------

    def _extract(
        self, node: ast.expr, pre: List[ast.stmt]
    ) -> ast.expr:
        """Rewrite ``node``, appending remote-marker assigns to ``pre``.

        Children are processed first (left-to-right field order matches
        Python evaluation order for the supported node types), then the
        node itself is replaced by a temp if it is a remote op.
        """
        if isinstance(node, (ast.Lambda, ast.ListComp, ast.SetComp,
                             ast.DictComp, ast.GeneratorExp)):
            self._check_no_remote_inside(node, "lambda/comprehension")
            return node
        if isinstance(node, (ast.BoolOp, ast.IfExp)):
            self._check_no_remote_inside(
                node, "short-circuit expression (and/or/ternary)"
            )
            return node

        # Remote method call: e.m(args)
        if isinstance(node, ast.Call) and isinstance(node.func, ast.Attribute):
            target = node.func.value
            ecls = self._entity_class_of(target)
            if ecls is not None:
                if ecls in self.members and node.func.attr not in self.members[
                    ecls
                ][0]:
                    raise self._err(
                        node,
                        f"entity class {ecls} has no method "
                        f"'{node.func.attr}'",
                    )
                self.remote_classes.add(ecls)
                new_target = self._extract(target, pre)
                args = [self._extract(a, pre) for a in node.args]
                if node.keywords:
                    raise self._err(
                        node, "keyword arguments in remote calls are not "
                        "supported; pass positionally"
                    )
                tmp = self._fresh()
                pre.append(
                    _assign(
                        tmp,
                        _call(
                            REMOTE_CALL,
                            [new_target, ast.Constant(node.func.attr), *args],
                        ),
                    )
                )
                self.n_remote += 1
                return ast.Name(tmp, ast.Load())
            if self._entity_list_class_of(target) is not None:
                raise self._err(
                    node,
                    "calling a method on a List[Entity] value; iterate and "
                    "call per element",
                )

        # Remote entity creation: E(args)
        if (
            isinstance(node, ast.Call)
            and isinstance(node.func, ast.Name)
            and node.func.id in self.entity_names
        ):
            self.remote_classes.add(node.func.id)
            args = [self._extract(a, pre) for a in node.args]
            if node.keywords:
                raise self._err(
                    node, "keyword arguments in entity creation are not "
                    "supported; pass positionally"
                )
            tmp = self._fresh()
            pre.append(
                _assign(
                    tmp,
                    _call(
                        REMOTE_CREATE,
                        [ast.Constant(node.func.id), *args],
                    ),
                )
            )
            self.n_remote += 1
            return ast.Name(tmp, ast.Load())

        # Remote attribute read: e.a  (not the func of a call — that case
        # was consumed above)
        if isinstance(node, ast.Attribute) and isinstance(node.ctx, ast.Load):
            ecls = self._entity_class_of(node.value)
            if ecls is not None and not (
                _is_self(node.value)
            ):
                if ecls in self.members and node.attr not in self.members[
                    ecls
                ][1]:
                    raise self._err(
                        node,
                        f"entity class {ecls} has no state variable "
                        f"'{node.attr}'",
                    )
                self.remote_classes.add(ecls)
                new_target = self._extract(node.value, pre)
                tmp = self._fresh()
                pre.append(
                    _assign(
                        tmp,
                        _call(REMOTE_GET, [new_target, ast.Constant(node.attr)]),
                    )
                )
                self.n_remote += 1
                return ast.Name(tmp, ast.Load())

        # generic: rebuild with extracted children, preserving field order
        for fname, value in ast.iter_fields(node):
            if isinstance(value, ast.expr):
                setattr(node, fname, self._extract(value, pre))
            elif isinstance(value, list):
                setattr(
                    node,
                    fname,
                    [
                        self._extract(v, pre)
                        if isinstance(v, ast.expr)
                        else self._extract_kw(v, pre)
                        for v in value
                    ],
                )
        return node

    def _extract_kw(self, node: ast.AST, pre: List[ast.stmt]) -> ast.AST:
        if isinstance(node, ast.keyword):
            node.value = self._extract(node.value, pre)
            return node
        if isinstance(node, ast.comprehension):
            return node  # already checked remote-free
        return node

    def _check_no_remote_inside(self, node: ast.AST, what: str) -> None:
        # names bound by the construct itself that would be entity-typed
        # (e.g. the loop var of a comprehension over a List[Entity])
        inner_entities: Set[str] = set()
        for sub in ast.walk(node):
            if (
                isinstance(sub, ast.comprehension)
                and isinstance(sub.target, ast.Name)
                and self._entity_list_class_of(sub.iter) is not None
            ):
                inner_entities.add(sub.target.id)

        def is_entity_target(e: ast.expr) -> bool:
            if self._entity_class_of(e) is not None:
                return True
            return isinstance(e, ast.Name) and e.id in inner_entities

        for sub in ast.walk(node):
            if isinstance(sub, ast.Call) and isinstance(
                sub.func, ast.Attribute
            ):
                if is_entity_target(sub.func.value):
                    raise self._err(
                        sub, f"remote call inside {what} cannot be split"
                    )
            if isinstance(sub, ast.Call) and isinstance(sub.func, ast.Name):
                if sub.func.id in self.entity_names:
                    raise self._err(
                        sub, f"entity creation inside {what} cannot be split"
                    )
            if isinstance(sub, ast.Attribute) and not _is_self(sub.value):
                if is_entity_target(sub.value):
                    raise self._err(
                        sub,
                        f"remote attribute read inside {what} cannot be split",
                    )

    # -- statement normalization ----------------------------------------

    def normalize_body(self, body: List[ast.stmt]) -> List[ast.stmt]:
        out: List[ast.stmt] = []
        for stmt in body:
            out.extend(self._normalize_stmt(stmt))
        return out

    def _normalize_stmt(self, stmt: ast.stmt) -> List[ast.stmt]:
        pre: List[ast.stmt] = []
        if isinstance(stmt, ast.Assign):
            if len(stmt.targets) != 1:
                raise self._err(stmt, "chained assignment not supported")
            self._reject_remote_store(stmt.targets[0])
            stmt.value = self._extract(stmt.value, pre)
            return pre + [stmt]
        if isinstance(stmt, ast.AnnAssign):
            self._reject_remote_store(stmt.target)
            if stmt.value is not None:
                stmt.value = self._extract(stmt.value, pre)
            # register locally-annotated entity names (convention for
            # typing the results of remote calls, see DESIGN.md §4)
            if isinstance(stmt.target, ast.Name):
                t = parse_type(stmt.annotation, self.entity_names)
                if t.is_entity:
                    self.env.entities[stmt.target.id] = t.entity_class
                elif t.is_entity_list:
                    self.env.entity_lists[
                        stmt.target.id
                    ] = t.element_entity_class
            return pre + [stmt]
        if isinstance(stmt, ast.AugAssign):
            self._reject_remote_store(stmt.target)
            stmt.value = self._extract(stmt.value, pre)
            return pre + [stmt]
        if isinstance(stmt, ast.Expr):
            stmt.value = self._extract(stmt.value, pre)
            return pre + [stmt]
        if isinstance(stmt, ast.Return):
            if stmt.value is not None:
                stmt.value = self._extract(stmt.value, pre)
            return pre + [stmt]
        if isinstance(stmt, (ast.Assert, ast.Raise)):
            self._check_no_remote_inside(stmt, "assert/raise")
            return [stmt]
        if isinstance(stmt, (ast.Pass, ast.Break, ast.Continue)):
            return [stmt]
        if isinstance(stmt, ast.If):
            stmt.test = self._extract(stmt.test, pre)
            stmt.body = self.normalize_body(stmt.body)
            stmt.orelse = self.normalize_body(stmt.orelse)
            return pre + [stmt]
        if isinstance(stmt, ast.While):
            test_pre: List[ast.stmt] = []
            new_test = self._extract(stmt.test, test_pre)
            body = self.normalize_body(stmt.body)
            if test_pre:
                # remote ops in the condition must re-run every iteration
                guard = ast.If(
                    test=ast.UnaryOp(ast.Not(), new_test),
                    body=[ast.Break()],
                    orelse=[],
                )
                loop = ast.While(
                    test=ast.Constant(True),
                    body=test_pre + [guard] + body,
                    orelse=[],
                )
                return [loop]
            stmt.test = new_test
            stmt.body = body
            return [stmt]
        if isinstance(stmt, ast.For):
            if not isinstance(stmt.target, ast.Name):
                raise self._err(
                    stmt, "for-loop target must be a simple name"
                )
            if stmt.orelse:
                raise self._err(stmt, "for/else not supported")
            elem_cls = self._entity_list_class_of(stmt.iter)
            stmt.iter = self._extract(stmt.iter, pre)
            if elem_cls is not None:
                self.env.entities[stmt.target.id] = elem_cls
            stmt.body = self.normalize_body(stmt.body)
            return pre + [stmt]
        raise self._err(
            stmt,
            f"unsupported statement {type(stmt).__name__} in a method with "
            "remote references",
        )

    def _reject_remote_store(self, target: ast.expr) -> None:
        if isinstance(target, ast.Attribute) and not _is_self(target.value):
            if self._entity_class_of(target.value) is not None:
                raise self._err(
                    target,
                    "assigning to a remote entity attribute is not allowed; "
                    "mutate remote entities through their methods",
                )


def _assign(name: str, value: ast.expr) -> ast.Assign:
    return ast.Assign(targets=[ast.Name(name, ast.Store())], value=value)


def _call(fn: str, args: List[ast.expr]) -> ast.Call:
    return ast.Call(func=ast.Name(fn, ast.Load()), args=args, keywords=[])


class _RemoteScan(ast.NodeVisitor):
    """Flow-insensitive pre-scan: could this method contain remote ops?

    Over-approximates (any attribute access / call on a name that is
    *anywhere* declared entity-typed, or any entity-class constructor
    call). A hit triggers full flow-sensitive normalization; a miss means
    the method is definitely simple.
    """

    def __init__(self, candidates: Set[str], entity_names: Set[str]):
        self.candidates = candidates
        self.entity_names = entity_names
        self.found = False

    def visit_Attribute(self, node: ast.Attribute) -> None:
        v = node.value
        if isinstance(v, ast.Name) and v.id in self.candidates:
            self.found = True
        if (
            isinstance(v, ast.Attribute)
            and _is_self(v.value)
            and v.attr in self.candidates
        ):
            self.found = True
        self.generic_visit(node)

    def visit_Call(self, node: ast.Call) -> None:
        if isinstance(node.func, ast.Name) and node.func.id in self.entity_names:
            self.found = True
        self.generic_visit(node)


def normalize_method(
    desc: ClassDescriptor,
    method: MethodInfo,
    entity_names: Set[str],
    members: Optional[Dict[str, Tuple[Set[str], Set[str]]]] = None,
) -> NormalizedMethod:
    """Normalize one method; returns original body if no remote ops."""
    fn = method.node
    # candidate entity-typed names: params + any AnnAssign/loop-var name
    candidates: Set[str] = set(method.entity_env) | set(method.entity_list_env)
    candidates |= set(desc.entity_state_vars()) | set(
        desc.entity_list_state_vars()
    )
    for sub in ast.walk(fn):
        if isinstance(sub, ast.AnnAssign) and isinstance(sub.target, ast.Name):
            t = parse_type(sub.annotation, entity_names)
            if t.is_entity or t.is_entity_list:
                candidates.add(sub.target.id)
                if t.is_entity_list:
                    # loop vars over that list are entity candidates too
                    for f in ast.walk(fn):
                        if (
                            isinstance(f, ast.For)
                            and isinstance(f.target, ast.Name)
                            and isinstance(f.iter, ast.Name)
                            and f.iter.id == sub.target.id
                        ):
                            candidates.add(f.target.id)
        if (
            isinstance(sub, ast.For)
            and isinstance(sub.target, ast.Name)
            and isinstance(sub.iter, ast.Name)
            and sub.iter.id in (set(method.entity_list_env)
                                | set(desc.entity_list_state_vars()))
        ):
            candidates.add(sub.target.id)
        if (
            isinstance(sub, ast.comprehension)
            and isinstance(sub.target, ast.Name)
            and isinstance(sub.iter, ast.Name)
            and sub.iter.id in (set(method.entity_list_env)
                                | set(desc.entity_list_state_vars()))
        ):
            candidates.add(sub.target.id)
    for v in desc.entity_list_state_vars():
        candidates.add(v)
    scan = _RemoteScan(candidates, entity_names)
    scan.visit(fn)
    original = [_copy_stmt(s) for s in fn.body]
    if not scan.found:
        return NormalizedMethod(body=original, n_remote=0, eligible=False)
    norm = _Normalizer(desc, method, entity_names, members)
    body = norm.normalize_body([_copy_stmt(s) for s in fn.body])
    if norm.n_remote == 0:
        # pre-scan over-approximated; the method is actually simple
        return NormalizedMethod(body=original, n_remote=0, eligible=False)
    body = [ast.fix_missing_locations(s) for s in body]
    return NormalizedMethod(
        body=body,
        n_remote=norm.n_remote,
        eligible=True,
        remote_classes=set(norm.remote_classes),
    )


def _copy_stmt(s: ast.stmt) -> ast.stmt:
    import copy

    return copy.deepcopy(s)
