"""Generic synthetic star-schema builder used by Favorita/TPC-DS-lite.

The paper's preprocessing (Section 6, "Preprocess") is baked in: every
dimension gets one *imputed* predictive feature drawn uniformly from
``[1, 1000]`` (so trees stay balanced and training cost is not an
artifact of degenerate splits), the fact's target is a deterministic
formula over the joined dimension features plus Gaussian noise, and any
number of extra non-predictive features can be appended to dimensions
(the #features-scaling experiment) or payload columns to the fact (the
residual-update CREATE-k microbenchmark).

Everything is generated with NumPy on the driver and shipped to Spark
via Arrow; generators are deterministic in ``seed`` so the DuckDB
oracle and the NumPy baseline see byte-identical inputs.
"""
from __future__ import annotations

from dataclasses import dataclass, field
from typing import Callable, Dict, List, Optional, Sequence

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from ..core.join_graph import JoinGraph


@dataclass
class DimSpec:
    """One dimension table: ``name(key, feature, extra features...)``."""

    name: str
    key: str
    n_rows: int
    feature: str  # the imputed predictive feature (ints in [1, 1000])
    n_extra: int = 0  # extra non-predictive features f"{name}_x{i}"


@dataclass
class StarData:
    """Generated tables (pandas) + the assembled Spark JoinGraph."""

    fact_name: str
    fact: pd.DataFrame
    dims: Dict[str, pd.DataFrame]
    graph: JoinGraph
    y: str = "y"

    def wide_pandas(self) -> pd.DataFrame:
        """Materialized ``R⋈`` in pandas — for oracles and baselines."""
        out = self.fact
        for spec_name, pdf in self.dims.items():
            key = [c for c in pdf.columns if c in out.columns]
            out = out.merge(pdf, on=key, how="inner")
        return out


def build_star(
    spark: SparkSession,
    fact_name: str,
    fact_rows: int,
    dims: Sequence[DimSpec],
    target: Callable[[Dict[str, np.ndarray]], np.ndarray],
    noise_sigma: float = 1.0,
    n_fact_payload: int = 0,
    seed: int = 0,
) -> StarData:
    """Build a star schema whose fact target is ``target(features) + noise``.

    ``target`` receives ``{dim_feature_name: per-fact-row values}`` and
    returns the noiseless y. Dimension features are ints in [1, 1000].
    """
    rng = np.random.default_rng(seed)
    dim_pdfs: Dict[str, pd.DataFrame] = {}
    fact_cols: Dict[str, np.ndarray] = {}
    feat_by_fact_row: Dict[str, np.ndarray] = {}
    for d in dims:
        cols = {
            d.key: np.arange(1, d.n_rows + 1, dtype="int64"),
            d.feature: rng.integers(1, 1001, d.n_rows),
        }
        for i in range(d.n_extra):
            cols[f"{d.name}_x{i}"] = rng.integers(1, 1001, d.n_rows)
        dim_pdfs[d.name] = pd.DataFrame(cols)
        fk = rng.integers(1, d.n_rows + 1, fact_rows)
        if d.key not in fact_cols:  # dims may share a key (e.g. date)
            fact_cols[d.key] = fk
        feat_by_fact_row[d.feature] = (
            dim_pdfs[d.name][d.feature].to_numpy()[fact_cols[d.key] - 1]
        )
    y = target(feat_by_fact_row).astype("float64")
    y = y + rng.normal(0.0, noise_sigma, fact_rows)
    fact_cols["y"] = y
    for i in range(n_fact_payload):
        fact_cols[f"payload_{i}"] = rng.random(fact_rows)
    fact_pdf = pd.DataFrame(fact_cols)

    graph = JoinGraph()
    fact_df = spark.createDataFrame(fact_pdf)
    graph.add_relation(fact_name, fact_df, features=[], y="y")
    for d in dims:
        ddf = spark.createDataFrame(dim_pdfs[d.name])
        feats = [d.feature] + [f"{d.name}_x{i}" for i in range(d.n_extra)]
        graph.add_relation(d.name, ddf, features=feats, numeric=feats)
        graph.add_edge(fact_name, d.name, [d.key])
    return StarData(fact_name, fact_pdf, dim_pdfs, graph)
