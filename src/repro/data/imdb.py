"""IMDB-lite: a galaxy schema with an M-N join blow-up (paper Fig 3, §6.2).

Two fact tables share the ``movie`` dimension:

    person ← cast_info → movie ← movie_company → company

``cast_info`` (person ⋈ movie credits) and ``movie_company``
(movie ⋈ company deals) are both many-to-one into ``movie``, so the
full join ``R⋈`` multiplies per-movie cast size by per-movie company
count — the M-N blow-up that makes the real IMDB join >1TB. The
generator reports ``join_rows`` so the library-baseline gate can refuse
to materialize, mirroring "LightGBM cannot run because the join result
is >1TB".

CPT clusters discovered from the graph:
``cluster(cast_info) = {cast_info, person, movie}`` and
``cluster(movie_company) = {movie_company, movie, company}``.

The target lives on ``movie`` (e.g. a rating) — the 1-N relationship
between ``R_Y`` and ``R⋈`` is exactly the side-effect case factorized
boosting must handle via update annotations (§4.2).
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Dict

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession

from ..core.join_graph import JoinGraph


@dataclass
class GalaxyData:
    graph: JoinGraph
    tables: Dict[str, pd.DataFrame]
    join_rows: int  # |R⋈| — computed analytically, never materialized

    def wide_pandas(self) -> pd.DataFrame:
        """Materialize ``R⋈`` in pandas — only safe at test scale."""
        t = self.tables
        out = t["cast_info"].merge(t["person"], on="person_id")
        out = out.merge(t["movie"], on="movie_id")
        out = out.merge(t["movie_company"], on="movie_id")
        return out.merge(t["company"], on="company_id")


def imdb(
    spark: SparkSession,
    n_movies: int = 200,
    mean_cast: float = 8.0,
    mean_companies: float = 3.0,
    seed: int = 0,
) -> GalaxyData:
    """IMDB-lite at a chosen movie count and M-N fan-outs.

    ``join_rows = Σ_m cast(m)·companies(m)`` grows as
    ``n_movies · mean_cast · mean_companies`` — crank the fan-outs to
    make materialization infeasible while base tables stay tiny.
    """
    rng = np.random.default_rng(seed)
    n_persons = max(10, n_movies * 4)
    n_companies = max(5, n_movies // 4)

    movie = pd.DataFrame(
        {
            "movie_id": np.arange(1, n_movies + 1),
            "m_year": rng.integers(1, 1001, n_movies),
            "rating": None,  # filled below from the feature formula
        }
    )
    person = pd.DataFrame(
        {
            "person_id": np.arange(1, n_persons + 1),
            "p_age": rng.integers(1, 1001, n_persons),
        }
    )
    company = pd.DataFrame(
        {
            "company_id": np.arange(1, n_companies + 1),
            "co_size": rng.integers(1, 1001, n_companies),
        }
    )
    cast_sizes = 1 + rng.poisson(mean_cast - 1, n_movies)
    comp_sizes = 1 + rng.poisson(mean_companies - 1, n_movies)
    cast_info = pd.DataFrame(
        {
            "movie_id": np.repeat(movie["movie_id"].to_numpy(), cast_sizes),
            "person_id": rng.integers(1, n_persons + 1, int(cast_sizes.sum())),
            "ci_role": rng.integers(1, 1001, int(cast_sizes.sum())),
        }
    )
    movie_company = pd.DataFrame(
        {
            "movie_id": np.repeat(movie["movie_id"].to_numpy(), comp_sizes),
            "company_id": rng.integers(1, n_companies + 1, int(comp_sizes.sum())),
            "mc_deal": rng.integers(1, 1001, int(comp_sizes.sum())),
        }
    )
    # target on movie: a function of its own feature + mean cast/company
    # features, so splits in both clusters are predictive
    p_by_id = person["p_age"].to_numpy()
    co_by_id = company["co_size"].to_numpy()
    mean_age = (
        pd.Series(p_by_id[cast_info["person_id"].to_numpy() - 1])
        .groupby(cast_info["movie_id"].to_numpy())
        .mean()
        .reindex(movie["movie_id"], fill_value=500.0)
        .to_numpy()
    )
    mean_co = (
        pd.Series(co_by_id[movie_company["company_id"].to_numpy() - 1])
        .groupby(movie_company["movie_id"].to_numpy())
        .mean()
        .reindex(movie["movie_id"], fill_value=500.0)
        .to_numpy()
    )
    movie["rating"] = (
        movie["m_year"].to_numpy() * 2.0
        + mean_age
        - mean_co
        + rng.normal(0, 50.0, n_movies)
    )

    join_rows = int((cast_sizes * comp_sizes).sum())

    g = JoinGraph()
    g.add_relation(
        "movie",
        spark.createDataFrame(movie),
        features=["m_year"],
        numeric=["m_year"],
        y="rating",
    )
    g.add_relation(
        "person", spark.createDataFrame(person), features=["p_age"], numeric=["p_age"]
    )
    g.add_relation(
        "company",
        spark.createDataFrame(company),
        features=["co_size"],
        numeric=["co_size"],
    )
    g.add_relation(
        "cast_info",
        spark.createDataFrame(cast_info),
        features=["ci_role"],
        numeric=["ci_role"],
    )
    g.add_relation(
        "movie_company",
        spark.createDataFrame(movie_company),
        features=["mc_deal"],
        numeric=["mc_deal"],
    )
    g.add_edge("cast_info", "person", ["person_id"])
    g.add_edge("cast_info", "movie", ["movie_id"])
    g.add_edge("movie_company", "movie", ["movie_id"])
    g.add_edge("movie_company", "company", ["company_id"])

    tables = {
        "movie": movie,
        "person": person,
        "company": company,
        "cast_info": cast_info,
        "movie_company": movie_company,
    }
    return GalaxyData(g, tables, join_rows)
