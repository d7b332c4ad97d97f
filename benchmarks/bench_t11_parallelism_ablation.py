"""T11 (paper Fig 18): inter-query parallelism on/off."""
from repro.experiments.tables import t11_parallelism_ablation


def test_t11_parallelism_ablation(spark, run_table):
    res = run_table(t11_parallelism_ablation, spark, sf=0.02, n_trees=4)
    assert len(res.rows) == 4
