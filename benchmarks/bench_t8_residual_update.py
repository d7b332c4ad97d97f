"""T8 (paper Figs 5/15): residual-update strategy microbenchmark."""
from repro.experiments.tables import t8_residual_update


def test_t8_residual_update(spark, run_table):
    res = run_table(t8_residual_update, spark, n_rows=1_000_000)
    t = {r["method"]: r["update_s"] for r in res.rows}
    assert t["naive-k0"] > t["swap-k10"]  # the paper's headline ordering
