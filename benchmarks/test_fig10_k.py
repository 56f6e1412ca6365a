"""Benchmark: Fig. 10 — sensitivity to number of strata K.

Bench scale: datasets at SF=0.1 of paper sizes, 60 Monte-Carlo trials
(paper: full size, 1000 trials). Prints the table rows and saves them
to results/fig10_k.csv for EXPERIMENTS.md.
"""
from repro.experiments.tables import table_fig10


def test_fig10_k(benchmark, spark, save_table):
    def run():
        return table_fig10(spark, scale=0.1, n_trials=100)

    table = benchmark.pedantic(run, rounds=1, iterations=1)
    save_table(table, "fig10_k")
    assert len(table) > 0
