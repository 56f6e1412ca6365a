"""Benchmark: Fig. 5 — budget vs bootstrap CI width + coverage.

Bench scale: datasets at SF=0.1 of paper sizes, 60 Monte-Carlo trials
(paper: full size, 1000 trials). Prints the table rows and saves them
to results/fig5_ci.csv for EXPERIMENTS.md.
"""
from repro.experiments.tables import table_fig5


def test_fig5_ci(benchmark, spark, save_table):
    def run():
        return table_fig5(spark, scale=0.1, n_trials=60)

    table = benchmark.pedantic(run, rounds=1, iterations=1)
    save_table(table, "fig5_ci")
    assert len(table) > 0
