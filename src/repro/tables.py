"""Markdown table rendering for experiment rows (EXPERIMENTS.md)."""
from __future__ import annotations

from typing import Any, Optional


def fmt(v: Any) -> str:
    if v is None:
        return "-"
    if isinstance(v, float):
        if v == 0:
            return "0"
        if abs(v) >= 1000:
            return f"{v:,.0f}"
        if abs(v) >= 10:
            return f"{v:.1f}"
        return f"{v:.2f}"
    return str(v)


def markdown_table(rows: list[dict], columns: Optional[list[str]] = None) -> str:
    """Render a list of dict rows as a GitHub-flavoured markdown table."""
    if not rows:
        return "(no rows)"
    cols = columns or list(rows[0].keys())
    out = ["| " + " | ".join(cols) + " |", "|" + "---|" * len(cols)]
    for r in rows:
        out.append("| " + " | ".join(fmt(r.get(c)) for c in cols) + " |")
    return "\n".join(out)


def print_table(title: str, rows: list[dict], columns: Optional[list[str]] = None) -> str:
    s = f"\n## {title}\n\n" + markdown_table(rows, columns) + "\n"
    print(s)
    return s
