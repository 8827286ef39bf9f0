"""Markdown table formatting for paper-vs-measured comparisons."""
from __future__ import annotations

from typing import Dict, List, Sequence


def markdown_table(headers: Sequence[str], rows: List[Sequence]) -> str:
    """Render a GitHub-flavoured markdown table."""
    def fmt(x) -> str:
        if isinstance(x, float):
            return f"{x:.3f}" if abs(x) < 100 else f"{x:.1f}"
        return str(x)

    lines = ["| " + " | ".join(headers) + " |", "|" + "|".join("---" for _ in headers) + "|"]
    for r in rows:
        lines.append("| " + " | ".join(fmt(x) for x in r) + " |")
    return "\n".join(lines)


def table4_markdown(breakdown: Dict[str, Dict[str, float]]) -> str:
    """Format a run_breakdown() result like the paper's Table 4."""
    label = {
        "qdist_time": "Query distance calculation (s)",
        "leader_time": "Leader pair update (s)",
        "butterfly_counting": "#butterfly counting (calls)",
        "total_time": "Total time (s)",
    }
    rows = []
    for key, lab in label.items():
        sp = breakdown["speedup"][key]
        rows.append(
            (
                lab,
                round(breakdown["Online-BCC"][key], 4),
                round(breakdown["LP-BCC"][key], 4),
                f"{sp:.1f}x" if sp != float("inf") else "inf",
            )
        )
    return markdown_table(["Step", "Online-BCC", "LP-BCC", "Speedup"], rows)
