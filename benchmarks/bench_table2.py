"""Benchmark: Table 2 (dataset statistics over the full suite)."""
from repro.experiments.tables import table2


def test_bench_table2_stats(benchmark):
    df = benchmark(table2)
    assert len(df) == 5
