"""Benchmark: Fig. 11 — sensitivity to Stage-1 fraction C.

Bench scale: datasets at SF=0.1 of paper sizes, 60 Monte-Carlo trials
(paper: full size, 1000 trials). Prints the table rows and saves them
to results/fig11_c.csv for EXPERIMENTS.md.
"""
from repro.experiments.tables import table_fig11


def test_fig11_c(benchmark, spark, save_table):
    def run():
        return table_fig11(spark, scale=0.1, n_trials=100)

    table = benchmark.pedantic(run, rounds=1, iterations=1)
    save_table(table, "fig11_c")
    assert len(table) > 0
