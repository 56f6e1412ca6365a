"""Benchmark: Fig. 3 — low budgets vs RMSE.

Bench scale: datasets at SF=0.1 of paper sizes, 100 Monte-Carlo trials
(paper: full size, 1000 trials). Prints the table rows and saves them
to results/fig3_low_budgets.csv for EXPERIMENTS.md.
"""
from repro.experiments.tables import table_fig3


def test_fig3_low_budgets(benchmark, spark, save_table):
    def run():
        return table_fig3(spark, scale=0.1, n_trials=100)

    table = benchmark.pedantic(run, rounds=1, iterations=1)
    save_table(table, "fig3_low_budgets")
    assert len(table) > 0
