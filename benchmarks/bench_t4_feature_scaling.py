"""T4 (paper Fig 10): scaling the number of features."""
from repro.experiments.tables import t4_feature_scaling


def test_t4_feature_scaling(spark, run_table):
    res = run_table(
        t4_feature_scaling, spark, sf=0.05,
        feature_counts=(5, 15, 30, 50), n_iters=2,
    )
    assert res.rows[-1]["library_oom"] is True  # 50 features gated
