"""T5 (paper Fig 11): scaling the database size (TPC-DS-lite)."""
from repro.experiments.tables import t5_size_scaling


def test_t5_size_scaling(spark, run_table):
    res = run_table(
        t5_size_scaling, spark, sfs=(0.02, 0.05, 0.1), n_iters=2
    )
    assert res.rows[-1]["library_oom"] is True  # largest SF gated
