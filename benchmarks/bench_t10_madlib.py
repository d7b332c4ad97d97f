"""T10 (paper Fig 16b): JoinBoost vs the MADLib-like comparator."""
from repro.experiments.tables import t10_madlib


def test_t10_madlib(spark, run_table):
    res = run_table(t10_madlib, spark, n_rows=10_000, max_leaves=4)
    t = {r["method"]: r for r in res.rows}
    assert t["madlib-like"]["train_s"] > t["joinboost"]["train_s"]
    assert t["madlib-like"]["queries"] > t["joinboost"]["queries"]
