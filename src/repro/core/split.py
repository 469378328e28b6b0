"""Function splitting (paper §2.3, Fig. 2).

Consumes a *normalized* method body (remote ops are statement-level
markers, see :mod:`repro.core.normalize`) and produces a
:class:`~repro.core.statemachine.StateMachine`:

* statements accumulate into straight-line **blocks**;
* a remote marker ``__rN = __remote__(target, 'm', a, b)`` closes the
  current block — the block's tail evaluates the call target and
  arguments into hidden locals (``__call_K_target``, ``__call_K_args``)
  — and emits a :class:`RemoteCallNode` whose resume binds ``__rN``;
* every control-flow element in an eligible method is split (paper:
  "the function is split when either a remote call or control flow
  element is encountered"): ``if`` → :class:`CondNode` with true/false
  chains, ``for`` → :class:`ForNode` (iterable materialized + hidden
  index in the preceding block), ``while`` → :class:`CondNode` whose
  body tail loops back; ``break``/``continue`` are wired as jumps;
* ``return e`` stores ``__ret`` and jumps to ``EXIT``.

Each block is also code-generated in the paper's style — a function
named ``<method>_<i>`` taking the variables it **uses** as parameters
and returning the variables it **defines** (used/defined computed by a
straight-line dataflow scan) — exactly the ``buy_item_0``/``buy_item_1``
convention of §2.3.
"""
from __future__ import annotations

import ast
from typing import Any, Dict, List, Optional, Set, Tuple

from repro.core.analysis import ClassDescriptor, CompileError, MethodInfo
from repro.core.normalize import (
    NormalizedMethod,
    REMOTE_CALL,
    REMOTE_CREATE,
    REMOTE_GET,
)
from repro.core.statemachine import (
    EXIT,
    BlockNode,
    CondNode,
    ForNode,
    RemoteCallNode,
    RET_VAR,
    StateMachine,
)

_Edge = Tuple[int, str]  # (node_id, attr) pending a successor


def _collect_local_names(
    method: MethodInfo, body: List[ast.stmt]
) -> Set[str]:
    """All names that are locals of this method (params + stores)."""
    names = {p.name for p in method.params}
    for stmt in body:
        for n in ast.walk(stmt):
            if isinstance(n, ast.Name) and isinstance(n.ctx, ast.Store):
                names.add(n.id)
    return names


def _scan_used_defined(
    stmts: List[ast.stmt], local_names: Set[str]
) -> Tuple[List[str], List[str]]:
    """Used-before-defined / defined names of a straight-line block.

    ``used`` become the block function's parameters, ``defined`` its
    returned variables — the paper's variable-passing convention.
    """
    used: List[str] = []
    defined: List[str] = []

    def _dfs(node: ast.AST):
        """Depth-first, field-order traversal (≈ evaluation order)."""
        yield node
        for child in ast.iter_child_nodes(node):
            yield from _dfs(child)

    def loads(node: ast.AST) -> None:
        for n in _dfs(node):
            if (
                isinstance(n, ast.Name)
                and isinstance(n.ctx, ast.Load)
                and n.id in local_names
                and n.id not in defined
                and n.id not in used
            ):
                used.append(n.id)

    def stores(node: ast.AST) -> None:
        for n in _dfs(node):
            if (
                isinstance(n, ast.Name)
                and isinstance(n.ctx, ast.Store)
                and n.id not in defined
            ):
                defined.append(n.id)

    for stmt in stmts:
        if isinstance(stmt, ast.Assign):
            loads(stmt.value)
            for t in stmt.targets:
                loads(t)  # subscript/attribute bases are Load-ctx Names
                stores(t)
        elif isinstance(stmt, ast.AnnAssign):
            if stmt.value is not None:
                loads(stmt.value)
            loads(stmt.target)
            stores(stmt.target)
        elif isinstance(stmt, ast.AugAssign):
            loads(stmt.value)
            if isinstance(stmt.target, ast.Name):
                if (
                    stmt.target.id in local_names
                    and stmt.target.id not in defined
                    and stmt.target.id not in used
                ):
                    used.append(stmt.target.id)  # x += 1 uses x
                stores(stmt.target)
            else:
                loads(stmt.target)
        elif isinstance(stmt, (ast.Expr, ast.Assert, ast.Raise)):
            loads(stmt)
        elif isinstance(stmt, ast.Pass):
            pass
        else:  # pragma: no cover - splitter only emits the above
            loads(stmt)
            stores(stmt)
    return used, defined


def _is_remote_marker(stmt: ast.stmt) -> bool:
    return (
        isinstance(stmt, ast.Assign)
        and len(stmt.targets) == 1
        and isinstance(stmt.targets[0], ast.Name)
        and isinstance(stmt.value, ast.Call)
        and isinstance(stmt.value.func, ast.Name)
        and stmt.value.func.id in (REMOTE_CALL, REMOTE_GET, REMOTE_CREATE)
    )


def _assign(name: str, value: ast.expr) -> ast.stmt:
    return ast.fix_missing_locations(
        ast.Assign(targets=[ast.Name(name, ast.Store())], value=value)
    )


class _Splitter:
    def __init__(
        self,
        desc: ClassDescriptor,
        method: MethodInfo,
        local_names: Set[str],
    ):
        self.desc = desc
        self.method = method
        self.local_names = local_names
        self.nodes: Dict[int, Any] = {}
        self._nid = 0
        self._kid = 0  # call-site / loop counter for hidden locals
        self._bid = 0  # paper-style block index (<method>_<i>)
        #: loop context stack: (head_node_id, break_edges)
        self._loops: List[Tuple[int, List[_Edge]]] = []

    # -- node helpers ---------------------------------------------------

    def _new_id(self) -> int:
        self._nid += 1
        return self._nid

    def _patch(self, edges: List[_Edge], target: int) -> None:
        for nid, attr in edges:
            setattr(self.nodes[nid], attr, target)

    def _make_block(self, stmts: List[ast.stmt]) -> int:
        used, defined = _scan_used_defined(stmts, self.local_names)
        name = f"{self.method.name.strip('_') if self.method.name == '__init__' else self.method.name}_{self._bid}"
        self._bid += 1
        fn = ast.FunctionDef(
            name=name,
            args=ast.arguments(
                posonlyargs=[],
                args=[ast.arg("self")] + [ast.arg(u) for u in used],
                kwonlyargs=[],
                kw_defaults=[],
                defaults=[],
            ),
            body=list(stmts)
            + [
                ast.Return(
                    ast.Dict(
                        keys=[ast.Constant(d) for d in defined],
                        values=[ast.Name(d, ast.Load()) for d in defined],
                    )
                )
            ],
            decorator_list=[],
        )
        src = ast.unparse(ast.fix_missing_locations(ast.Module([fn], [])))
        nid = self._new_id()
        self.nodes[nid] = BlockNode(
            id=nid, name=name, params=used, defines=defined, source=src
        )
        return nid

    # -- the splitting walk ---------------------------------------------

    def split_seq(
        self, stmts: List[ast.stmt]
    ) -> Tuple[Optional[int], List[_Edge], bool]:
        """Split a statement sequence.

        Returns ``(head, pending, terminated)`` — the chain's entry node
        (``None`` for an empty sequence), the dangling edges awaiting the
        successor, and whether every path already ended (return/break/
        continue) so no successor edge exists.
        """
        head: Optional[int] = None
        pending: List[_Edge] = []
        cur: List[ast.stmt] = []

        def attach(nid: int) -> List[_Edge]:
            nonlocal head, pending
            if head is None:
                head = nid
            self._patch(pending, nid)
            pending = []
            return pending

        def flush() -> None:
            nonlocal cur, pending
            if cur:
                nid = self._make_block(cur)
                attach(nid)
                pending = [(nid, "next")]
                cur = []

        i = 0
        while i < len(stmts):
            stmt = stmts[i]
            i += 1
            if _is_remote_marker(stmt):
                self._emit_remote(stmt, cur)
                flush_pending = self._flush_remote(stmt, cur, attach)
                cur = []
                pending = flush_pending
                # head/pending updated inside
                continue
            if isinstance(stmt, ast.If):
                flush()
                cn_id = self._new_id()
                self.nodes[cn_id] = CondNode(
                    id=cn_id, test_src=ast.unparse(stmt.test)
                )
                attach(cn_id)
                t_head, t_pend, t_term = self.split_seq(stmt.body)
                f_head, f_pend, f_term = self.split_seq(stmt.orelse)
                new_pending: List[_Edge] = []
                if t_head is not None:
                    self.nodes[cn_id].true_next = t_head
                    new_pending += t_pend
                elif not t_term:
                    new_pending.append((cn_id, "true_next"))
                if f_head is not None:
                    self.nodes[cn_id].false_next = f_head
                    new_pending += f_pend
                elif not f_term:
                    new_pending.append((cn_id, "false_next"))
                pending = new_pending
                if not new_pending:
                    # both branches terminated: rest is unreachable
                    return head, [], True
                continue
            if isinstance(stmt, ast.While):
                flush()
                cn_id = self._new_id()
                self.nodes[cn_id] = CondNode(
                    id=cn_id, test_src=ast.unparse(stmt.test)
                )
                attach(cn_id)
                breaks: List[_Edge] = []
                self._loops.append((cn_id, breaks))
                b_head, b_pend, b_term = self.split_seq(stmt.body)
                self._loops.pop()
                self.nodes[cn_id].true_next = (
                    b_head if b_head is not None else cn_id
                )
                if not b_term:
                    self._patch(b_pend, cn_id)  # loop back to the test
                pending = [(cn_id, "false_next")] + breaks
                continue
            if isinstance(stmt, ast.For):
                k = self._kid
                self._kid += 1
                iter_var, idx_var = f"__iter_{k}", f"__idx_{k}"
                cur.append(
                    _assign(
                        iter_var,
                        ast.Call(
                            func=ast.Name("list", ast.Load()),
                            args=[stmt.iter],
                            keywords=[],
                        ),
                    )
                )
                cur.append(_assign(idx_var, ast.Constant(0)))
                flush()
                fn_id = self._new_id()
                assert isinstance(stmt.target, ast.Name)
                self.nodes[fn_id] = ForNode(
                    id=fn_id,
                    loop_var=stmt.target.id,
                    iter_var=iter_var,
                    idx_var=idx_var,
                )
                attach(fn_id)
                breaks = []
                self._loops.append((fn_id, breaks))
                b_head, b_pend, b_term = self.split_seq(stmt.body)
                self._loops.pop()
                self.nodes[fn_id].body_next = (
                    b_head if b_head is not None else fn_id
                )
                if not b_term:
                    self._patch(b_pend, fn_id)  # next iteration
                pending = [(fn_id, "after_next")] + breaks
                continue
            if isinstance(stmt, ast.Return):
                cur.append(
                    _assign(RET_VAR, stmt.value or ast.Constant(None))
                )
                flush()
                self._patch(pending, EXIT)
                return head, [], True
            if isinstance(stmt, ast.Break):
                if not self._loops:
                    raise CompileError(
                        f"{self.desc.name}.{self.method.name}: 'break' "
                        "outside loop"
                    )
                if not cur:
                    cur.append(ast.Pass())
                flush()
                self._loops[-1][1].extend(pending)
                return head, [], True
            if isinstance(stmt, ast.Continue):
                if not self._loops:
                    raise CompileError(
                        f"{self.desc.name}.{self.method.name}: 'continue' "
                        "outside loop"
                    )
                if not cur:
                    cur.append(ast.Pass())
                flush()
                self._patch(pending, self._loops[-1][0])
                return head, [], True
            cur.append(stmt)
        flush()
        return head, pending, False

    def _emit_remote(self, stmt: ast.stmt, cur: List[ast.stmt]) -> None:
        """Append target/args evaluation for a remote marker to ``cur``."""
        call = stmt.value  # type: ignore[attr-defined]
        fn = call.func.id
        k = self._kid
        if fn == REMOTE_CREATE:
            target: ast.expr = ast.Constant(None)
            args = call.args[1:]
        else:
            target = call.args[0]
            args = call.args[2:] if fn == REMOTE_CALL else []
        cur.append(_assign(f"__call_{k}_target", target))
        cur.append(
            _assign(
                f"__call_{k}_args",
                ast.List(elts=list(args), ctx=ast.Load()),
            )
        )

    def _flush_remote(self, stmt, cur, attach) -> List[_Edge]:
        """Close the current block and emit the RemoteCallNode."""
        call = stmt.value
        fn = call.func.id
        k = self._kid
        self._kid += 1
        nid_block = self._make_block(cur)
        attach(nid_block)
        rn_id = self._new_id()
        if fn == REMOTE_CALL:
            kind, mname = "call", call.args[1].value
        elif fn == REMOTE_GET:
            kind, mname = "get", call.args[1].value
        else:
            kind, mname = "create", call.args[0].value
        self.nodes[rn_id] = RemoteCallNode(
            id=rn_id,
            call_kind=kind,
            method=mname,
            call_id=k,
            result_var=stmt.targets[0].id,
        )
        self.nodes[nid_block].next = rn_id
        return [(rn_id, "next")]


def _param_defaults(method: MethodInfo) -> Dict[str, Any]:
    """Literal default values, for call-time argument filling."""
    args = method.node.args
    defaults: Dict[str, Any] = {}
    plain = args.args[1:]  # skip self
    for arg, d in zip(plain[len(plain) - len(args.defaults):], args.defaults):
        try:
            defaults[arg.arg] = ast.literal_eval(d)
        except ValueError as e:
            raise CompileError(
                f"{method.name}: default for '{arg.arg}' must be a literal"
            ) from e
    return defaults


def split_method(
    desc: ClassDescriptor,
    method: MethodInfo,
    normalized: NormalizedMethod,
) -> StateMachine:
    """Compile one method into its state machine."""
    param_names = [p.name for p in method.params]
    defaults = _param_defaults(method)
    if not normalized.eligible:
        # Strip annotations: they would be evaluated at def-time on the
        # worker, where entity type names do not exist.
        plain_args = ast.arguments(
            posonlyargs=[],
            args=[ast.arg("self")] + [ast.arg(p.name) for p in method.params],
            kwonlyargs=[],
            kw_defaults=[],
            defaults=[
                ast.Constant(defaults[p.name])
                for p in method.params
                if p.name in defaults
            ],
        )
        fn = ast.FunctionDef(
            name=method.name,
            args=plain_args,
            body=[_strip_docstring(s) for s in normalized.body] or [ast.Pass()],
            decorator_list=[],
            returns=None,
        )
        fn.body = [s for s in fn.body if s is not None] or [ast.Pass()]
        src = ast.unparse(ast.fix_missing_locations(ast.Module([fn], [])))
        return StateMachine(
            class_name=desc.name,
            method=method.name,
            entry=EXIT,
            nodes={},
            eligible=False,
            simple_source=src,
            param_names=param_names,
            param_defaults=defaults,
        )
    local_names = _collect_local_names(method, normalized.body)
    sp = _Splitter(desc, method, local_names)
    head, pending, _term = sp.split_seq(list(normalized.body))
    sp._patch(pending, EXIT)
    return StateMachine(
        class_name=desc.name,
        method=method.name,
        entry=head if head is not None else EXIT,
        nodes=sp.nodes,
        eligible=True,
        param_names=param_names,
        param_defaults=defaults,
    )


def _strip_docstring(s: ast.stmt) -> Optional[ast.stmt]:
    if isinstance(s, ast.Expr) and isinstance(s.value, ast.Constant) and isinstance(
        s.value.value, str
    ):
        return None
    return s
