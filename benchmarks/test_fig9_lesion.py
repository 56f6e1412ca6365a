"""Benchmark: Fig. 9 — lesion study.

Bench scale: datasets at SF=0.1 of paper sizes, 100 Monte-Carlo trials
(paper: full size, 1000 trials). Prints the table rows and saves them
to results/fig9_lesion.csv for EXPERIMENTS.md.
"""
from repro.experiments.tables import table_fig9


def test_fig9_lesion(benchmark, spark, save_table):
    def run():
        return table_fig9(spark, scale=0.1, n_trials=100)

    table = benchmark.pedantic(run, rounds=1, iterations=1)
    save_table(table, "fig9_lesion")
    assert len(table) > 0
