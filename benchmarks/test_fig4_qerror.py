"""Benchmark: Fig. 4 — budget vs normalized Q-error.

Bench scale: datasets at SF=0.1 of paper sizes, 100 Monte-Carlo trials
(paper: full size, 1000 trials). Prints the table rows and saves them
to results/fig4_qerror.csv for EXPERIMENTS.md.
"""
from repro.experiments.tables import table_fig4


def test_fig4_qerror(benchmark, spark, save_table):
    def run():
        return table_fig4(spark, scale=0.1, n_trials=100)

    table = benchmark.pedantic(run, rounds=1, iterations=1)
    save_table(table, "fig4_qerror")
    assert len(table) > 0
