"""T2 (paper Fig 8b,c): gradient boosting time and rmse vs iterations."""
from repro.experiments.tables import t2_gradient_boosting


def test_t2_gradient_boosting(spark, run_table):
    res = run_table(t2_gradient_boosting, spark, sf=0.5, n_iters=6)
    # rmse must improve monotonically on both sides
    rmses = [r["joinboost_rmse"] for r in res.rows]
    assert rmses == sorted(rmses, reverse=True)
