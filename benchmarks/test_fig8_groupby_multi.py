"""Benchmark: Fig. 8 — group-by, multiple oracles, max RMSE.

Bench scale: datasets at SF=0.1 of paper sizes, 60 Monte-Carlo trials
(paper: full size, 1000 trials). Prints the table rows and saves them
to results/fig8_groupby_multi.csv for EXPERIMENTS.md.
"""
from repro.experiments.tables import table_fig8


def test_fig8_groupby_multi(benchmark, spark, save_table):
    def run():
        return table_fig8(spark, scale=0.1, n_trials=100)

    table = benchmark.pedantic(run, rounds=1, iterations=1)
    save_table(table, "fig8_groupby_multi")
    assert len(table) > 0
