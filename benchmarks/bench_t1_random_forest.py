"""T1 (paper Fig 8a): random forest vs the ML-library pipeline."""
from repro.experiments.tables import t1_random_forest


def test_t1_random_forest(spark, run_table):
    res = run_table(t1_random_forest, spark, sf=0.5, n_trees=8)
    assert len(res.rows) >= 4
