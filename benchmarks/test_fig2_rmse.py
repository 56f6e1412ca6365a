"""Benchmark: Fig. 2 — budget vs RMSE, ABAE vs uniform, six datasets.

Bench scale: datasets at SF=0.1 of paper sizes, 100 Monte-Carlo trials
(paper: full size, 1000 trials). Prints the table rows and saves them
to results/fig2_rmse.csv for EXPERIMENTS.md.
"""
from repro.experiments.tables import table_fig2


def test_fig2_rmse(benchmark, spark, save_table):
    def run():
        return table_fig2(spark, scale=0.1, n_trials=100)

    table = benchmark.pedantic(run, rounds=1, iterations=1)
    save_table(table, "fig2_rmse")
    assert len(table) > 0
