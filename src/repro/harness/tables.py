"""Plain-text table rendering for the experiment harnesses.

Each harness returns a list of row dicts; :func:`render_table` prints the
selected columns aligned, mirroring how the paper's tables (Table I,
Fig. 9(b)) lay out their numbers so `EXPERIMENTS.md` can diff them.
"""
from __future__ import annotations

from typing import Dict, List, Sequence


def _fmt(v) -> str:
    if v is None:
        return "X"  # the paper's marker for capacity failures
    if isinstance(v, float):
        return f"{v:.3f}" if abs(v) < 10 else f"{v:.1f}"
    return str(v)


def render_table(rows: List[Dict], columns: Sequence[str], title: str = "") -> str:
    """Align ``columns`` of ``rows`` into a monospace table string."""
    header = list(columns)
    body = [[_fmt(r.get(c)) for c in header] for r in rows]
    widths = [max(len(h), *(len(b[i]) for b in body)) if body else len(h) for i, h in enumerate(header)]
    lines = []
    if title:
        lines.append(f"== {title} ==")
    lines.append("  ".join(h.ljust(w) for h, w in zip(header, widths)))
    lines.append("  ".join("-" * w for w in widths))
    for b in body:
        lines.append("  ".join(v.ljust(w) for v, w in zip(b, widths)))
    return "\n".join(lines)
