"""Shared I/O for the per-table jobs: print the measured table next to
the paper's published numbers and persist it under results/."""
from __future__ import annotations

import os

from .tables import HEADER, PAPER


def emit(table_id: str, title: str, lines: list[str], out_dir: str | None = "results") -> str:
    """Render one reproduced table (markdown) with the paper's numbers
    appended for diffing; write to ``<out_dir>/table<ID>.md`` and return
    the text."""
    parts = [f"# Table {table_id} — {title}", "", HEADER, *lines, ""]
    if table_id in PAPER:
        parts += ["```", PAPER[table_id], "```", ""]
    text = "\n".join(parts)
    print(text)
    if out_dir:
        os.makedirs(out_dir, exist_ok=True)
        path = os.path.join(out_dir, f"table{table_id}.md")
        with open(path, "w") as f:
            f.write(text)
    return text
