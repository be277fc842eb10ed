"""Benchmark for Table 1: the Spark size-reduction aggregation."""
from repro.core.analysis import size_reduction_table


def test_bench_table1_size_reduction(benchmark, spark, bench_meta):
    row = benchmark(size_reduction_table, bench_meta)
    assert row["scan_10"] == 1.0
    assert row["scan_1"] > 1.0
