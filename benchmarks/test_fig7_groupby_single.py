"""Benchmark: Fig. 7 — group-by, single oracle, max RMSE.

Bench scale: datasets at SF=0.1 of paper sizes, 60 Monte-Carlo trials
(paper: full size, 1000 trials). Prints the table rows and saves them
to results/fig7_groupby_single.csv for EXPERIMENTS.md.
"""
from repro.experiments.tables import table_fig7


def test_fig7_groupby_single(benchmark, spark, save_table):
    def run():
        return table_fig7(spark, scale=0.1, n_trials=150)

    table = benchmark.pedantic(run, rounds=1, iterations=1)
    save_table(table, "fig7_groupby_single")
    assert len(table) > 0
