"""Static-analysis unit tests (paper §2.1: declared types, __key__,
programming-model assumptions)."""
import ast

import pytest

from repro.core.analysis import (
    CompileError,
    analyze_class,
    parse_type,
)

from tests.zoo import Acc, Driver

ENTITIES = {"Acc", "Driver", "Item"}


def _parse_ann(src: str):
    return ast.parse(src, mode="eval").body


class TestParseType:
    def test_entity_scalar(self):
        t = parse_type(_parse_ann("Acc"), ENTITIES)
        assert t.is_entity and t.entity_class == "Acc"

    def test_non_entity_scalar(self):
        t = parse_type(_parse_ann("int"), ENTITIES)
        assert not t.is_entity and not t.is_entity_list
        assert t.text == "int"

    @pytest.mark.parametrize("src", ["List[Acc]", "list[Acc]"])
    def test_entity_list(self, src):
        t = parse_type(_parse_ann(src), ENTITIES)
        assert t.is_entity_list and t.element_entity_class == "Acc"

    def test_non_entity_list(self):
        t = parse_type(_parse_ann("List[int]"), ENTITIES)
        assert not t.is_entity_list

    def test_string_annotation_entity(self):
        t = parse_type(ast.Constant("Acc"), ENTITIES)
        assert t.is_entity

    def test_string_annotation_list(self):
        t = parse_type(ast.Constant("List[Acc]"), ENTITIES)
        assert t.is_entity_list

    def test_none_annotation(self):
        t = parse_type(None, ENTITIES)
        assert t.text == "Any"

    def test_dict_is_plain(self):
        t = parse_type(_parse_ann("Dict[str, Acc]"), ENTITIES)
        assert not t.is_entity and not t.is_entity_list


class TestAnalyzeZoo:
    def test_acc_descriptor(self):
        d = analyze_class(Acc, {"Acc", "Driver"})
        assert d.name == "Acc"
        assert set(d.state_vars) == {"accid", "total"}
        assert d.key_var == "accid"
        assert set(d.methods) == {"__init__", "add", "peek", "fail", "maybe"}

    def test_driver_entity_state_vars(self):
        d = analyze_class(Driver, {"Acc", "Driver"})
        assert d.entity_state_vars() == {"acc": "Acc"}
        assert d.key_var == "did"

    def test_method_entity_env(self):
        d = analyze_class(Driver, {"Acc", "Driver"})
        m = d.methods["read_attr"]
        assert m.entity_env == {"other": "Acc"}

    def test_method_entity_list_env(self):
        d = analyze_class(Driver, {"Acc", "Driver"})
        m = d.methods["loop_entities"]
        assert m.entity_list_env == {"accs": "Acc"}

    def test_param_defaults_flagged(self):
        d = analyze_class(Driver, {"Acc", "Driver"})
        m = d.methods["default_arg"]
        assert m.params[0].has_default


def _cls_from(src: str, name: str) -> type:
    from tests.zoo import cls_from_source

    return cls_from_source(src, name)


class TestValidation:
    def test_missing_key_rejected(self):
        C = _cls_from(
            """
            class C:
                def __init__(self, cid: str):
                    self.cid: str = cid
            """,
            "C",
        )
        with pytest.raises(CompileError, match="__key__"):
            analyze_class(C, {"C"})

    def test_key_must_return_state_var(self):
        C = _cls_from(
            """
            class C:
                def __init__(self, cid: str):
                    self.cid: str = cid
                def __key__(self):
                    return 42
            """,
            "C",
        )
        with pytest.raises(CompileError, match="return self"):
            analyze_class(C, {"C"})

    def test_key_must_come_from_same_named_param(self):
        C = _cls_from(
            """
            class C:
                def __init__(self, name: str):
                    self.cid: str = name
                def __key__(self):
                    return self.cid
            """,
            "C",
        )
        with pytest.raises(CompileError, match="identically-named"):
            analyze_class(C, {"C"})

    def test_unannotated_param_rejected(self):
        C = _cls_from(
            """
            class C:
                def __init__(self, cid: str):
                    self.cid: str = cid
                def __key__(self):
                    return self.cid
                def m(self, x):
                    return x
            """,
            "C",
        )
        with pytest.raises(CompileError, match="type-annotated"):
            analyze_class(C, {"C"})

    def test_star_args_rejected(self):
        C = _cls_from(
            """
            class C:
                def __init__(self, cid: str):
                    self.cid: str = cid
                def __key__(self):
                    return self.cid
                def m(self, *xs: int):
                    return 1
            """,
            "C",
        )
        with pytest.raises(CompileError, match="not supported"):
            analyze_class(C, {"C"})

    def test_unannotated_state_var_rejected(self):
        C = _cls_from(
            """
            class C:
                def __init__(self, cid: str):
                    self.cid: str = cid
                    self.x = compute()
                def __key__(self):
                    return self.cid
            """,
            "C",
        )
        with pytest.raises(CompileError, match="must be .*annotated"):
            analyze_class(C, {"C"})

    def test_state_var_type_from_param_copy(self):
        C = _cls_from(
            """
            class C:
                def __init__(self, cid: str, n: int):
                    self.cid: str = cid
                    self.n = n
                def __key__(self):
                    return self.cid
            """,
            "C",
        )
        d = analyze_class(C, {"C"})
        assert d.state_vars["n"].text == "int"

    def test_missing_init_rejected(self):
        C = _cls_from(
            """
            class C:
                def __key__(self):
                    return self.cid
            """,
            "C",
        )
        with pytest.raises(CompileError, match="__init__"):
            analyze_class(C, {"C"})

    def test_missing_self_rejected(self):
        C = _cls_from(
            """
            class C:
                def __init__(this, cid: str):
                    this.cid = cid
                def __key__(self):
                    return self.cid
            """,
            "C",
        )
        with pytest.raises(CompileError, match="self"):
            analyze_class(C, {"C"})

    def test_no_state_vars_rejected(self):
        C = _cls_from(
            """
            class C:
                def __init__(self):
                    pass
                def __key__(self):
                    return self.x
            """,
            "C",
        )
        with pytest.raises(CompileError, match="no state variables"):
            analyze_class(C, {"C"})
