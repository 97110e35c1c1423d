"""Benchmark for the Table-1 harness (dataset analog generation)."""
from repro.experiments.table1 import dataset_table


def test_bench_table1_dataset_stats(benchmark):
    table = benchmark.pedantic(
        lambda: dataset_table(scale=0.2), rounds=3, iterations=1
    )
    assert len(table) == 4
