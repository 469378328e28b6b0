"""LOC counting for the abstraction experiment (T5, paper §4
"StateFlow's abstraction vs. other systems").

Counts *source lines of code*: non-blank, non-comment lines, excluding
docstrings (located via the AST). The baseline service is additionally
classified into infrastructure vs. business-logic sections using its
``# === infrastructure: ... ===`` / ``# === business logic ===`` fences,
mirroring the paper's "~30% of the Go LOC is infrastructure" analysis.
"""
from __future__ import annotations

import ast
import os
from dataclasses import dataclass
from typing import Dict, List, Set, Tuple

import repro


def _docstring_lines(source: str) -> Set[int]:
    """1-based line numbers occupied by docstrings."""
    out: Set[int] = set()
    try:
        tree = ast.parse(source)
    except SyntaxError:
        return out
    for node in ast.walk(tree):
        if isinstance(
            node, (ast.Module, ast.ClassDef, ast.FunctionDef, ast.AsyncFunctionDef)
        ):
            body = getattr(node, "body", [])
            if (
                body
                and isinstance(body[0], ast.Expr)
                and isinstance(body[0].value, ast.Constant)
                and isinstance(body[0].value.value, str)
            ):
                for ln in range(body[0].lineno, body[0].end_lineno + 1):
                    out.add(ln)
    return out


def count_loc(path: str) -> int:
    """Count source lines of code in a Python file."""
    with open(path) as f:
        source = f.read()
    doc = _docstring_lines(source)
    n = 0
    for i, line in enumerate(source.splitlines(), start=1):
        stripped = line.strip()
        if not stripped or stripped.startswith("#") or i in doc:
            continue
        n += 1
    return n


def count_loc_by_section(path: str) -> Dict[str, int]:
    """LOC per ``# === section ===`` fence; lines before the first fence
    land in section 'header'."""
    with open(path) as f:
        source = f.read()
    doc = _docstring_lines(source)
    section = "header"
    out: Dict[str, int] = {}
    for i, line in enumerate(source.splitlines(), start=1):
        stripped = line.strip()
        if stripped.startswith("# ===") :
            name = stripped.strip("# =").strip()
            section = "infrastructure" if name.startswith("infrastructure") else "business"
            continue
        if not stripped or stripped.startswith("#") or i in doc:
            continue
        out[section] = out.get(section, 0) + 1
    return out


def _pkg_path(*parts: str) -> str:
    return os.path.join(os.path.dirname(repro.__file__), *parts)


@dataclass
class LocReport:
    stateflow_loc: int
    baseline_total: int
    baseline_infra: int
    baseline_business: int
    adapter_loc: Dict[str, int]

    @property
    def baseline_infra_pct(self) -> float:
        return 100.0 * self.baseline_infra / self.baseline_total


#: runtime adapter files (what the paper reports as 87–169 LOC each)
ADAPTERS: Dict[str, Tuple[str, ...]] = {
    "local": ("runtimes", "local.py"),
    "faas": ("runtimes", "faas.py"),
    "spark_dataflow": ("runtimes", "spark_dataflow.py"),
    "spark_superstep": ("runtimes", "spark_superstep.py"),
}


def loc_report() -> LocReport:
    entities = _pkg_path("deathstar", "entities.py")
    baseline = _pkg_path("deathstar", "baseline_explicit.py")
    sections = count_loc_by_section(baseline)
    return LocReport(
        stateflow_loc=count_loc(entities),
        baseline_total=sum(sections.values()),
        baseline_infra=sections.get("infrastructure", 0)
        + sections.get("header", 0),
        baseline_business=sections.get("business", 0),
        adapter_loc={
            name: count_loc(_pkg_path(*parts))
            for name, parts in ADAPTERS.items()
        },
    )
