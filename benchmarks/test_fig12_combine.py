"""Benchmark: Fig. 12 — combining proxies via logistic regression.

Bench scale: datasets at SF=0.1 of paper sizes, 60 Monte-Carlo trials
(paper: full size, 1000 trials). Prints the table rows and saves them
to results/fig12_combine.csv for EXPERIMENTS.md.
"""
from repro.experiments.tables import table_fig12


def test_fig12_combine(benchmark, spark, save_table):
    def run():
        return table_fig12(spark, scale=0.1, n_trials=150)

    table = benchmark.pedantic(run, rounds=1, iterations=1)
    save_table(table, "fig12_combine")
    assert len(table) > 0
