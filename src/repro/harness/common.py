"""Shared harness utilities: scale presets and table formatting."""
from __future__ import annotations

from typing import Iterable


def fmt_markdown(rows: list[dict], floatfmt: str = "{:.3f}") -> str:
    """Render result rows as a GitHub markdown table (jobs' output)."""
    if not rows:
        return "(no rows)"
    cols = list(rows[0])
    def cell(v):
        if isinstance(v, float):
            return floatfmt.format(v)
        return str(v)
    out = ["| " + " | ".join(cols) + " |", "|" + "|".join("---" for _ in cols) + "|"]
    for r in rows:
        out.append("| " + " | ".join(cell(r.get(c, "")) for c in cols) + " |")
    return "\n".join(out)


def mean(xs: Iterable[float]) -> float:
    xs = list(xs)
    return sum(xs) / len(xs) if xs else 0.0


def pct(x: float) -> str:
    return f"{100 * x:.1f}%"
