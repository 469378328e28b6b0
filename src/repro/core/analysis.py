"""Static analysis of @stateflow classes (paper §2.1, Fig. 1 "analysis").

Parses the class source into an AST and extracts a :class:`ClassDescriptor`:

* **state variables** with their declared types (from ``__init__``),
* the **key variable** (from ``__key__``), statically checked to be bound
  from the identically-named ``__init__`` parameter so the entity key is
  derivable at the ingress router *before* the object exists,
* **methods** with typed parameters and an *entity environment* — the
  mapping from names to entity class names used later to detect remote
  references (paper: "StateFlow identifies if a function definition has
  references to a remote stateful entity using Python type annotations").

Analysis is purely syntactic; it never imports or executes user code
beyond what ``inspect.getsource`` needs.
"""
from __future__ import annotations

import ast
import inspect
import textwrap
from dataclasses import dataclass, field
from typing import Dict, List, Optional, Set


class CompileError(Exception):
    """A @stateflow class violates the programming-model assumptions."""


@dataclass
class TypeInfo:
    """A declared type: its source text plus entity resolution.

    ``entity_class`` is set when the type is an entity class ``E``;
    ``element_entity_class`` when it is ``List[E]`` / ``list[E]`` over an
    entity class (the element type entity-ness drives loop-var typing).
    """

    text: str
    entity_class: Optional[str] = None
    element_entity_class: Optional[str] = None

    @property
    def is_entity(self) -> bool:
        return self.entity_class is not None

    @property
    def is_entity_list(self) -> bool:
        return self.element_entity_class is not None


@dataclass
class ParamInfo:
    name: str
    type: TypeInfo
    has_default: bool = False


@dataclass
class MethodInfo:
    name: str
    params: List[ParamInfo]  # excludes self
    return_type: Optional[TypeInfo]
    node: ast.FunctionDef
    #: name -> entity class, for params declared entity-typed
    entity_env: Dict[str, str] = field(default_factory=dict)
    #: name -> element entity class, for params declared List[entity]
    entity_list_env: Dict[str, str] = field(default_factory=dict)


@dataclass
class ClassDescriptor:
    name: str
    state_vars: Dict[str, TypeInfo]
    key_var: str
    methods: Dict[str, MethodInfo]  # includes __init__, excludes __key__
    source: str

    def entity_state_vars(self) -> Dict[str, str]:
        """State vars whose declared type is an entity class."""
        return {
            n: t.entity_class for n, t in self.state_vars.items() if t.is_entity
        }

    def entity_list_state_vars(self) -> Dict[str, str]:
        return {
            n: t.element_entity_class
            for n, t in self.state_vars.items()
            if t.is_entity_list
        }


def parse_type(node: Optional[ast.expr], entity_names: Set[str]) -> TypeInfo:
    """Resolve an annotation AST node against the known entity class names."""
    if node is None:
        return TypeInfo(text="Any")
    text = ast.unparse(node)
    if isinstance(node, ast.Name) and node.id in entity_names:
        return TypeInfo(text=text, entity_class=node.id)
    if isinstance(node, ast.Constant) and isinstance(node.value, str):
        # string annotation, e.g. "Item" or "List[Item]"
        try:
            inner = ast.parse(node.value, mode="eval").body
        except SyntaxError:
            return TypeInfo(text=text)
        return parse_type(inner, entity_names)
    if isinstance(node, ast.Subscript):
        base = node.value
        if isinstance(base, ast.Name) and base.id in ("List", "list"):
            elem = node.slice
            if isinstance(elem, ast.Name) and elem.id in entity_names:
                return TypeInfo(text=text, element_entity_class=elem.id)
    return TypeInfo(text=text)


def _class_ast(cls: type) -> ast.ClassDef:
    src = textwrap.dedent(inspect.getsource(cls))
    mod = ast.parse(src)
    for node in mod.body:
        if isinstance(node, ast.ClassDef):
            return node
    raise CompileError(f"could not find class definition in source of {cls}")


def _analyze_params(
    fn: ast.FunctionDef, entity_names: Set[str], *, cls_name: str
) -> List[ParamInfo]:
    args = fn.args
    if not args.args or args.args[0].arg != "self":
        raise CompileError(
            f"{cls_name}.{fn.name}: first parameter must be 'self'"
        )
    if args.vararg or args.kwarg or args.kwonlyargs or args.posonlyargs:
        raise CompileError(
            f"{cls_name}.{fn.name}: *args/**kwargs/positional-only/"
            "keyword-only parameters are not supported"
        )
    n_defaults = len(args.defaults)
    params: List[ParamInfo] = []
    plain = args.args[1:]
    for i, a in enumerate(plain):
        if a.annotation is None:
            raise CompileError(
                f"{cls_name}.{fn.name}: parameter '{a.arg}' must be type-"
                "annotated (paper §2.1: all types declared)"
            )
        params.append(
            ParamInfo(
                name=a.arg,
                type=parse_type(a.annotation, entity_names),
                has_default=i >= len(plain) - n_defaults,
            )
        )
    return params


def _analyze_init_state(
    init: ast.FunctionDef,
    params: List[ParamInfo],
    entity_names: Set[str],
    cls_name: str,
) -> Dict[str, TypeInfo]:
    """Collect ``self.x`` assignments in ``__init__`` as state variables.

    Each must be either annotated (``self.x: T = ...``) or a direct copy
    of a parameter (``self.x = x``) from which the type is inherited.
    """
    by_param = {p.name: p for p in params}
    state: Dict[str, TypeInfo] = {}
    # pass 1: annotated declarations
    for stmt in ast.walk(init):
        if (
            isinstance(stmt, ast.AnnAssign)
            and isinstance(stmt.target, ast.Attribute)
            and isinstance(stmt.target.value, ast.Name)
            and stmt.target.value.id == "self"
        ):
            state[stmt.target.attr] = parse_type(stmt.annotation, entity_names)
    # pass 2: plain assigns — must copy a parameter (type inherited) or
    # re-assign an already-annotated state var
    for stmt in ast.walk(init):
        if not (
            isinstance(stmt, ast.Assign)
            and len(stmt.targets) == 1
            and isinstance(stmt.targets[0], ast.Attribute)
        ):
            continue
        target = stmt.targets[0]
        if not (
            isinstance(target.value, ast.Name) and target.value.id == "self"
        ):
            continue
        name = target.attr
        if name in state:
            continue
        if isinstance(stmt.value, ast.Name) and stmt.value.id in by_param:
            state[name] = by_param[stmt.value.id].type
        else:
            raise CompileError(
                f"{cls_name}.__init__: state var 'self.{name}' must be "
                "annotated (self.x: T = ...) or copied from a parameter "
                "(self.x = x)"
            )
    if not state:
        raise CompileError(f"{cls_name}: no state variables found in __init__")
    return state


def _analyze_key(
    cls_node: ast.ClassDef,
    init: ast.FunctionDef,
    state: Dict[str, TypeInfo],
    cls_name: str,
) -> str:
    key_fn = next(
        (
            n
            for n in cls_node.body
            if isinstance(n, ast.FunctionDef) and n.name == "__key__"
        ),
        None,
    )
    if key_fn is None:
        raise CompileError(f"{cls_name}: missing __key__() (paper §2.1)")
    body = [s for s in key_fn.body if not isinstance(s, (ast.Pass, ast.Expr))]
    if (
        len(body) != 1
        or not isinstance(body[0], ast.Return)
        or not isinstance(body[0].value, ast.Attribute)
        or not (
            isinstance(body[0].value.value, ast.Name)
            and body[0].value.value.id == "self"
        )
    ):
        raise CompileError(
            f"{cls_name}.__key__ must be exactly 'return self.<state_var>'"
        )
    key_var = body[0].value.attr
    if key_var not in state:
        raise CompileError(
            f"{cls_name}.__key__ returns self.{key_var} which is not a "
            "state variable"
        )
    # The key must be bound from the identically-named __init__ parameter
    # so the ingress router can compute it from the creation arguments.
    bound_from_param = False
    for stmt in ast.walk(init):
        tgt = None
        if isinstance(stmt, ast.AnnAssign) and isinstance(stmt.target, ast.Attribute):
            tgt, val = stmt.target, stmt.value
        elif isinstance(stmt, ast.Assign) and len(stmt.targets) == 1 and isinstance(
            stmt.targets[0], ast.Attribute
        ):
            tgt, val = stmt.targets[0], stmt.value
        if (
            tgt is not None
            and isinstance(tgt.value, ast.Name)
            and tgt.value.id == "self"
            and tgt.attr == key_var
            and isinstance(val, ast.Name)
            and val.id == key_var
        ):
            bound_from_param = True
    if not bound_from_param:
        raise CompileError(
            f"{cls_name}: key var 'self.{key_var}' must be assigned from "
            f"the identically-named __init__ parameter '{key_var}' so the "
            "key is derivable at the ingress router"
        )
    return key_var


def analyze_class(cls: type, entity_names: Set[str]) -> ClassDescriptor:
    """Run the full static pass over one @stateflow class."""
    cls_node = _class_ast(cls)
    cls_name = cls_node.name
    fns = {
        n.name: n for n in cls_node.body if isinstance(n, ast.FunctionDef)
    }
    if "__init__" not in fns:
        raise CompileError(f"{cls_name}: missing __init__")
    init = fns["__init__"]
    init_params = _analyze_params(init, entity_names, cls_name=cls_name)
    state = _analyze_init_state(init, init_params, entity_names, cls_name)
    key_var = _analyze_key(cls_node, init, state, cls_name)

    methods: Dict[str, MethodInfo] = {}
    for name, fn in fns.items():
        if name == "__key__":
            continue
        params = (
            init_params
            if name == "__init__"
            else _analyze_params(fn, entity_names, cls_name=cls_name)
        )
        info = MethodInfo(
            name=name,
            params=params,
            return_type=parse_type(fn.returns, entity_names)
            if fn.returns is not None
            else None,
            node=fn,
        )
        for p in params:
            if p.type.is_entity:
                info.entity_env[p.name] = p.type.entity_class
            elif p.type.is_entity_list:
                info.entity_list_env[p.name] = p.type.element_entity_class
        methods[name] = info

    return ClassDescriptor(
        name=cls_name,
        state_vars=state,
        key_var=key_var,
        methods=methods,
        source=textwrap.dedent(inspect.getsource(cls)),
    )
