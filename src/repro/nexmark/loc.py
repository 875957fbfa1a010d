"""Table 1 — lines of code of the NEXMark query implementations.

Counts non-blank, non-comment, non-docstring source lines of each query's
operator implementation, for the hand-written native version and the
Megaphone-interface version. The paper's absolute numbers are Rust; ours are
Python, so only the *relationship* (Megaphone's interface needs less code
for stateful queries because state/pending-record management is absorbed by
the helper structures) is expected to transfer.
"""
from __future__ import annotations

import ast
import inspect
import textwrap


def count_loc(obj) -> int:
    """Logical lines of code: source minus blanks, comments, docstrings."""
    src = textwrap.dedent(inspect.getsource(obj))
    tree = ast.parse(src)
    doc_lines: set[int] = set()
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
                d = body[0]
                doc_lines.update(range(d.lineno, d.end_lineno + 1))
    n = 0
    for i, line in enumerate(src.splitlines(), start=1):
        stripped = line.strip()
        if not stripped or stripped.startswith("#") or i in doc_lines:
            continue
        n += 1
    return n


PAPER_TABLE1 = {
    "q1": {"native": 12, "megaphone": 16},
    "q2": {"native": 14, "megaphone": 18},
    "q3": {"native": 58, "megaphone": 41},
    "q4": {"native": 128, "megaphone": 74},
    "q5": {"native": 73, "megaphone": 46},
    "q6": {"native": 130, "megaphone": 74},
    "q7": {"native": 55, "megaphone": 54},
    "q8": {"native": 58, "megaphone": 29},
}


def loc_table() -> list[dict]:
    """Measured LOC per query and implementation, with the paper's numbers."""
    from repro.nexmark.queries_megaphone import MEGAPHONE_IMPLS
    from repro.nexmark.queries_native import NATIVE_IMPLS

    rows = []
    for q in sorted(NATIVE_IMPLS):
        rows.append(
            {
                "query": q.upper(),
                "native_loc": count_loc(NATIVE_IMPLS[q]),
                "megaphone_loc": count_loc(MEGAPHONE_IMPLS[q]),
                "paper_native": PAPER_TABLE1[q]["native"],
                "paper_megaphone": PAPER_TABLE1[q]["megaphone"],
            }
        )
    return rows
