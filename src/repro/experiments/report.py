"""Small formatting helpers shared by the experiment jobs."""
from __future__ import annotations


def format_table(rows: list[dict], *, title: str | None = None) -> str:
    """Render dict rows as an aligned text table (paper-style)."""
    if not rows:
        return "(no rows)"
    cols = list(rows[0].keys())
    widths = {c: max(len(str(c)), *(len(_fmt(r.get(c))) for r in rows)) for c in cols}
    lines = []
    if title:
        lines.append(title)
    lines.append(" | ".join(str(c).ljust(widths[c]) for c in cols))
    lines.append("-+-".join("-" * widths[c] for c in cols))
    for r in rows:
        lines.append(" | ".join(_fmt(r.get(c)).ljust(widths[c]) for c in cols))
    return "\n".join(lines)


def _fmt(v) -> str:
    if isinstance(v, float):
        if v == 0:
            return "0"
        if abs(v) >= 1e9:
            return f"{v / 1e9:.2f}G"
        if abs(v) >= 1e6:
            return f"{v / 1e6:.2f}M"
        if abs(v) >= 1e3:
            return f"{v / 1e3:.2f}K"
        return f"{v:.3f}"
    return str(v)


def human_bytes(b: float) -> str:
    for unit, div in (("GB", 1e9), ("MB", 1e6), ("KB", 1e3)):
        if abs(b) >= div:
            return f"{b / div:.2f}{unit}"
    return f"{b:.0f}B"


def reduction_pct(baseline_s: float, tuned_s: float) -> float:
    """Percent reduction in execution time, as the paper reports it."""
    return 100.0 * (baseline_s - tuned_s) / baseline_s
