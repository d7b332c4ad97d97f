"""Shared experiment plumbing: result tables, persistence, formatting.

Every T-harness returns an :class:`ExperimentResult` whose rows are the
reproduction of one paper figure's underlying numbers. ``save()`` drops
them as JSON under ``results/`` so EXPERIMENTS.md can be assembled from
actual measured runs, and ``format()`` renders the aligned text table
that the bench output captures.
"""
from __future__ import annotations

import json
import pathlib
from dataclasses import dataclass, field
from typing import Dict, List

RESULTS_DIR = pathlib.Path(__file__).resolve().parents[3] / "results"


@dataclass
class ExperimentResult:
    table: str  # e.g. "T2"
    title: str
    rows: List[Dict] = field(default_factory=list)
    notes: List[str] = field(default_factory=list)

    def format(self) -> str:
        if not self.rows:
            return f"== {self.table}: {self.title} ==\n(no rows)"
        cols = list(self.rows[0].keys())
        widths = {
            c: max(len(c), *(len(_fmt(r.get(c))) for r in self.rows)) for c in cols
        }
        lines = [f"== {self.table}: {self.title} =="]
        lines.append("  ".join(c.ljust(widths[c]) for c in cols))
        for r in self.rows:
            lines.append("  ".join(_fmt(r.get(c)).ljust(widths[c]) for c in cols))
        for n in self.notes:
            lines.append(f"note: {n}")
        return "\n".join(lines)

    def save(self) -> pathlib.Path:
        RESULTS_DIR.mkdir(exist_ok=True)
        out = RESULTS_DIR / f"{self.table.lower()}.json"
        out.write_text(
            json.dumps(
                {"table": self.table, "title": self.title, "rows": self.rows,
                 "notes": self.notes},
                indent=2,
                default=str,
            )
        )
        return out


def _fmt(v) -> str:
    if v is None:
        return "-"
    if isinstance(v, float):
        return f"{v:.3f}"
    return str(v)
