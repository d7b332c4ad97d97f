"""The ML-library data pipeline: materialize ⋈ → export CSV → load.

The paper charges the ML libraries a "0th iteration" equal to the cost
of denormalizing the database into a wide table, exporting it (CSV) and
loading it into the library (Section 6, "Methods"). This module
reproduces that pipeline on Spark + pandas and reports a per-stage
timing breakdown, plus a **memory gate** that refuses to materialize
when the estimated wide table exceeds a budget — the stand-in for
"LightGBM runs out of memory" in the scaling experiments (Figs 10–12)
and "the join result is >1TB" for IMDB (Fig 14).
"""
from __future__ import annotations

import glob
import shutil
import tempfile
import time
from dataclasses import dataclass
from typing import Optional

import pandas as pd

from ..core.join_graph import JoinGraph


class MemoryGateError(MemoryError):
    """Raised when the estimated materialized join exceeds the budget."""


@dataclass
class PipelineResult:
    pdf: pd.DataFrame
    materialize_export_seconds: float
    load_seconds: float
    n_rows: int
    n_cols: int

    @property
    def total_seconds(self) -> float:
        return self.materialize_export_seconds + self.load_seconds


def estimate_wide_bytes(graph: JoinGraph, join_rows: Optional[int] = None) -> int:
    """Rough wide-table footprint: |R⋈| × (8 bytes × total columns).

    ``join_rows`` defaults to the Y-relation's fact-side row count for
    snowflake schemas (1-1 with R⋈); galaxy callers pass the analytic
    |R⋈| from their generator.
    """
    n_cols = sum(len(r.df.columns) for r in graph.relations.values()) - sum(
        len(e.keys) for e in graph.edges
    )  # each edge's join keys appear once in the wide table, not twice
    if join_rows is None:
        fact = next(iter(graph.clusters()))
        join_rows = graph.relations[fact].df.count()
    return int(join_rows) * max(1, n_cols) * 8


def export_load(
    graph: JoinGraph,
    memory_budget_bytes: Optional[int] = None,
    join_rows: Optional[int] = None,
) -> PipelineResult:
    """Run the full materialize→export→load pipeline with timings.

    Raises :class:`MemoryGateError` when the estimated wide table
    exceeds ``memory_budget_bytes`` — the scaled-down analogue of the
    library OOM-ing on the real hardware.
    """
    if memory_budget_bytes is not None:
        est = estimate_wide_bytes(graph, join_rows)
        if est > memory_budget_bytes:
            raise MemoryGateError(
                f"estimated wide table {est / 1e6:.1f} MB exceeds the "
                f"{memory_budget_bytes / 1e6:.1f} MB budget — the library "
                "baseline cannot materialize this join"
            )
    tmp = tempfile.mkdtemp(prefix="repro_export_")
    try:
        t0 = time.perf_counter()
        wide = graph.materialize()
        wide.write.mode("overwrite").option("header", True).csv(tmp)
        t1 = time.perf_counter()
        parts = sorted(glob.glob(f"{tmp}/part-*.csv"))
        pdf = pd.concat((pd.read_csv(p) for p in parts), ignore_index=True)
        t2 = time.perf_counter()
        return PipelineResult(pdf, t1 - t0, t2 - t1, len(pdf), len(pdf.columns))
    finally:
        shutil.rmtree(tmp, ignore_errors=True)
