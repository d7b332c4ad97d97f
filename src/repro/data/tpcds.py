"""TPC-DS-lite: scalable star schema for the size/feature sweeps.

The paper scales TPC-DS SF 10→1000 (145 features) for its scalability
experiments (Figs 10–13). We model the ``store_sales`` star: the fact
with N-to-1 edges to ``date_dim``, ``store``, ``item``, ``customer``
and ``promotion``, with a parameterized number of features so one
generator serves both the #features sweep (T4) and the DB-size sweep
(T5). ``SF=1`` ≡ 3M fact rows here (TPC-DS SF=1 is ~2.9M store_sales
rows, so our SF is roughly aligned with the benchmark's).
"""
from __future__ import annotations

import numpy as np
from pyspark.sql import SparkSession

from .star import DimSpec, StarData, build_star

_N_SALES_PER_SF = 3_000_000


def tpcds(
    spark: SparkSession,
    sf: float = 0.01,
    n_features: int = 10,
    noise_sigma: float = 500.0,
    seed: int = 0,
) -> StarData:
    """store_sales star at scale ``sf`` with ``n_features`` total features.

    Five predictive features (one per dimension) come first; the
    remaining ``n_features − 5`` are non-predictive and spread
    round-robin across dimensions, emulating the paper's imputation of
    up to 50 features over TPC-DS's 145.
    """
    if n_features < 5:
        raise ValueError("need at least the 5 per-dimension predictive features")
    fact_rows = max(100, int(_N_SALES_PER_SF * sf))
    extra = n_features - 5
    extras = [extra // 5 + (1 if i < extra % 5 else 0) for i in range(5)]
    dims = [
        DimSpec("date_dim", "date_sk", 365, "d_feat", extras[0]),
        DimSpec("store", "store_sk", 100, "s_feat", extras[1]),
        DimSpec("item", "item_sk", 2000, "i_feat", extras[2]),
        DimSpec("customer", "customer_sk", 5000, "c_feat", extras[3]),
        DimSpec("promotion", "promo_sk", 300, "p_feat", extras[4]),
    ]

    def target(f: dict) -> np.ndarray:
        return (
            f["i_feat"] * np.log(f["i_feat"])
            + 5.0 * f["d_feat"]
            - 10.0 * f["s_feat"]
            + f["c_feat"].astype("float64") ** 2 / 1000.0
            + np.log(f["p_feat"])
        )

    return build_star(
        spark,
        "store_sales",
        fact_rows,
        dims,
        target,
        noise_sigma=noise_sigma,
        seed=seed,
    )
