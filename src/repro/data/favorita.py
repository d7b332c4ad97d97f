"""Favorita-lite: the paper's primary dataset (Fig 7), scaled down.

Schema shape matches the paper: a ``sales`` fact with N-to-1 edges to
five dimensions — ``stores``, ``items``, ``transactions``, ``oil``,
``holiday``. Three of the dimensions share the ``date_id`` key (the
real Favorita keys transactions by (date, store); we key it by date
only to keep single-column join keys — the join graph shape and
training workload are unchanged).

Preprocessing follows Section 6: one imputed feature per dimension
(ints in [1, 1000]) and the paper's own target formula

    y = f_item·log(f_item) + log(f_oil) − 10·f_date − 10·f_store + f_trans²

(⁠footnote 7; ``f_date`` is the holiday dimension's feature) plus
Gaussian noise. ``SF=1`` ≡ 3M fact rows here (the real fact is 80M —
scaled to laptop budgets; the paper's SF-relative comparisons carry
over because every method sees the same data).
"""
from __future__ import annotations

import numpy as np
from pyspark.sql import SparkSession

from .star import DimSpec, StarData, build_star

_N_SALES_PER_SF = 3_000_000
N_STORES = 54
N_ITEMS = 1000
N_DATES = 365


def favorita(
    spark: SparkSession,
    sf: float = 0.01,
    n_extra_features: int = 8,
    n_fact_payload: int = 0,
    noise_sigma: float = 500.0,
    seed: int = 0,
) -> StarData:
    """Favorita-lite at scale factor ``sf``.

    ``n_extra_features`` non-predictive features are spread round-robin
    over the five dimensions (default 8 → 13 features total, matching
    the paper's 13).
    """
    fact_rows = max(100, int(_N_SALES_PER_SF * sf))
    extras = [n_extra_features // 5 + (1 if i < n_extra_features % 5 else 0) for i in range(5)]
    dims = [
        DimSpec("stores", "store_id", N_STORES, "f_store", extras[0]),
        DimSpec("items", "item_id", N_ITEMS, "f_item", extras[1]),
        DimSpec("transactions", "date_id", N_DATES, "f_trans", extras[2]),
        DimSpec("oil", "date_id", N_DATES, "f_oil", extras[3]),
        DimSpec("holiday", "date_id", N_DATES, "f_date", extras[4]),
    ]

    def target(f: dict) -> np.ndarray:
        return (
            f["f_item"] * np.log(f["f_item"])
            + np.log(f["f_oil"])
            - 10.0 * f["f_date"]
            - 10.0 * f["f_store"]
            + f["f_trans"].astype("float64") ** 2 / 1000.0
        )

    return build_star(
        spark,
        "sales",
        fact_rows,
        dims,
        target,
        noise_sigma=noise_sigma,
        n_fact_payload=n_fact_payload,
        seed=seed,
    )
