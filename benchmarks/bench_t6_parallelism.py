"""T6 (paper Figs 12/13): engine parallelism sweep (single box)."""
from repro.experiments.tables import t6_parallelism


def test_t6_parallelism(spark, run_table):
    res = run_table(t6_parallelism, spark, sf=0.05, partitions=(1, 4, 16))
    assert len(res.rows) == 3
