"""T9 (paper Fig 16a): JoinBoost vs LMFAO-like Batch vs Naive."""
from repro.experiments.tables import t9_lmfao


def test_t9_lmfao(spark, run_table):
    res = run_table(t9_lmfao, spark, sf=0.02, max_leaves=6)
    t = {r["method"]: r for r in res.rows}
    # cross-node caching must issue fewer message queries than batch
    assert t["joinboost"]["message_queries"] < t["batch"]["message_queries"]
