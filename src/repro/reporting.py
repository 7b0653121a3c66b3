"""Tiny result-table formatting/saving helpers shared by jobs and benches.

Every benchmark prints the paper-style rows AND persists them under
``benchmark_results/`` so EXPERIMENTS.md can be assembled from real runs.
"""
from __future__ import annotations

import os

RESULTS_DIR = os.path.join(os.path.dirname(os.path.dirname(os.path.dirname(__file__))), "benchmark_results")


def format_table(rows: list[dict], columns: list[str] | None = None) -> str:
    """Markdown table from a list of homogeneous dicts."""
    if not rows:
        return "(no rows)"
    columns = columns or list(rows[0])
    out = ["| " + " | ".join(columns) + " |", "|" + "---|" * len(columns)]
    for r in rows:
        cells = []
        for c in columns:
            v = r.get(c, "")
            cells.append(f"{v:.4g}" if isinstance(v, float) else str(v))
        out.append("| " + " | ".join(cells) + " |")
    return "\n".join(out)


def save_results(name: str, text: str) -> str:
    """Print a result block and persist it to benchmark_results/<name>.md."""
    os.makedirs(RESULTS_DIR, exist_ok=True)
    path = os.path.join(RESULTS_DIR, f"{name}.md")
    with open(path, "w") as f:
        f.write(text + "\n")
    print(f"\n===== {name} =====\n{text}\n(saved to {path})")
    return path
