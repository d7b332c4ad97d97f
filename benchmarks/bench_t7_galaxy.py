"""T7 (paper Fig 14): galaxy-schema GB with Clustered Predicate Trees."""
from repro.experiments.tables import t7_galaxy


def test_t7_galaxy(spark, run_table):
    res = run_table(t7_galaxy, spark, n_iters=3)
    assert any("gated" in n for n in res.notes)  # library cannot run
    rmses = [r["rmse"] for r in res.rows]
    assert rmses[-1] < rmses[0]
