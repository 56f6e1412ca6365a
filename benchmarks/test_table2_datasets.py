"""Benchmark: Table 2 — dataset inventory (generation cost + rows).

Saves results/table2_datasets.csv.
"""
from repro.experiments.tables import table2_datasets


def test_table2_datasets(benchmark, save_table):
    table = benchmark.pedantic(
        lambda: table2_datasets(scale=0.1), rounds=1, iterations=1
    )
    save_table(table, "table2_datasets")
    assert len(table) == 6
